package repro.jobs

import repro.exp._

/** Reproduces Table 6: the CLP (s, t) parameter sweep on the customer2 lake
  * (the paper's 42 TB enterprise dataset analog).
  */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("r2d2-table6")
    val runs = new RunCache(spark, JobSession.scale(args))
    println(SweepExperiment.render(SweepExperiment.run(runs("customer2"))))
    spark.stop()
  }
}
