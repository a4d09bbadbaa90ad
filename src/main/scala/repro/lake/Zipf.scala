package repro.lake

import scala.util.Random

/** Zipfian rank sampler over `{1..n}` with exponent `alpha`.
  *
  * The paper generates synthetic `SELECT … WHERE …` sampling queries from a
  * skewed Zipfian distribution fitted to enterprise query logs (§6.1.1);
  * this is that distribution. Sampling is by inverse CDF over the
  * precomputed rank weights 1/k^alpha.
  */
final class Zipf(n: Int, alpha: Double = 1.5) {
  require(n >= 1, "need at least one rank")
  private val cdf: Array[Double] = {
    val w = Array.tabulate(n)(k => 1.0 / math.pow(k + 1.0, alpha))
    val total = w.sum
    w.scanLeft(0.0)(_ + _).tail.map(_ / total)
  }

  /** Draw a 1-based rank. */
  def sample(rng: Random): Int = {
    val u = rng.nextDouble()
    val i = java.util.Arrays.binarySearch(cdf, u)
    val idx = if (i >= 0) i else -i - 1
    math.min(n, idx + 1)
  }
}
