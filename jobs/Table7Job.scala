package repro.jobs

import repro.exp._

/** Reproduces Table 7: OPT-RET deletion/retention recommendations and GDPR
  * row-scan savings on the detected containment graphs.
  */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("r2d2-table7")
    val runs = new RunCache(spark, JobSession.scale(args))
    val results = Seq("customer1", "customer2").map(n => OptimizationExperiment.run(n, runs(n)))
    println(OptimizationExperiment.render(results))
    spark.stop()
  }
}
