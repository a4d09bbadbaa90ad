package repro.jobs

import repro.exp._

/** Reproduces Table 3: pairwise row-level operation counts per method. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("r2d2-table3")
    val runs = new RunCache(spark, JobSession.scale(args))
    val outs = Seq("customer2", "customer1", "kaggle", "tableUnion").map(n => n -> runs(n))
    println(OpCountExperiment.render(outs))
    spark.stop()
  }
}
