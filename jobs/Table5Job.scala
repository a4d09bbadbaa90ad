package repro.jobs

import repro.exp._

/** Reproduces Table 5: per-stage wall-clock times vs brute-force ground
  * truth, at our scale.
  */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("r2d2-table5")
    val runs = new RunCache(spark, JobSession.scale(args))
    val outs = Seq("customer1", "customer2", "tableUnion", "kaggle").map(n => n -> runs(n))
    println(TimingExperiment.render(outs))
    spark.stop()
  }
}
