package repro.bench

import repro.SparkSpec
import repro.exp.RunCache

/** One shared RunCache for all bench suites: Tables 1/3/5 reuse the same
  * customer lakes, Table 6 reuses customer2's pipeline, etc. Suites run
  * sequentially in one JVM, so this memo makes `bench/test` one pipeline run
  * per lake profile.
  */
object BenchRuns {
  lazy val runs: RunCache = new RunCache(SparkSpec.shared, scale = 1.0)
}

/** Base trait: bench suites are ScalaTest suites over the shared session. */
trait BenchSpec extends SparkSpec {
  def runs: RunCache = BenchRuns.runs

  /** Print a report block so `bench/test | tee bench_output.txt` captures it. */
  def report(text: String): Unit = println(text)
}
