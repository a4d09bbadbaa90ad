package repro.jobs

import repro.exp._

/** Reproduces Table 4: schema-containment baselines vs SGB. */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("r2d2-table4")
    val runs = new RunCache(spark, JobSession.scale(args))
    val results = Seq("customer1", "customer2").map(n => BaselineExperiment.run(n, runs(n)))
    println(BaselineExperiment.render(results))
    spark.stop()
  }
}
