package repro.core

/** Theorem 4.2: sample-complexity bound for content-level pruning.
  *
  * If the containment fraction of a candidate edge is at most 1 − ε, then
  * `n_s ≥ ln(1/δ) / ln(1/(1−ε))` uniform row samples (with replacement) from
  * the child suffice to observe at least one non-contained row — and hence
  * prune the edge — with probability at least 1 − δ.
  */
object SamplingBound {

  /** Minimum number of samples (the paper's example: ε=0.1, δ=0.05 → 29). */
  def nSamples(eps: Double, delta: Double): Int = {
    require(eps > 0 && eps < 1, s"eps must be in (0,1), got $eps")
    require(delta > 0 && delta < 1, s"delta must be in (0,1), got $delta")
    math.ceil(math.log(1.0 / delta) / math.log(1.0 / (1.0 - eps))).toInt
  }

  /** Probability of failing to prune after `n` samples at containment 1 − ε. */
  def missProbability(eps: Double, n: Int): Double = math.pow(1.0 - eps, n.toDouble)
}
