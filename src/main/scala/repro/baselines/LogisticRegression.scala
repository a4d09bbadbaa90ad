package repro.baselines

/** Minimal deterministic batch-gradient-descent logistic regression, used by
  * the Bharadwaj et al. [3] baseline (their paper trains classifiers over
  * pair features; ours is a faithful stand-in at our scale).
  * Weight vector layout: [bias, w_1..w_d].
  */
object LogisticRegression {

  def sigmoid(z: Double): Double = 1.0 / (1.0 + math.exp(-z))

  def predict(w: Array[Double], x: Array[Double]): Double = {
    var z = w(0)
    var i = 0
    while (i < x.length) { z += w(i + 1) * x(i); i += 1 }
    sigmoid(z)
  }

  def train(
      xs: Array[Array[Double]],
      ys: Array[Int],
      epochs: Int = 400,
      lr: Double = 0.5,
      l2: Double = 1e-4,
  ): Array[Double] = {
    require(xs.nonEmpty && xs.length == ys.length, "need aligned samples")
    val d = xs(0).length
    val w = new Array[Double](d + 1)
    val n = xs.length.toDouble
    for (_ <- 0 until epochs) {
      val grad = new Array[Double](d + 1)
      for (k <- xs.indices) {
        val err = predict(w, xs(k)) - ys(k)
        grad(0) += err
        var i = 0
        while (i < d) { grad(i + 1) += err * xs(k)(i); i += 1 }
      }
      for (i <- w.indices) w(i) -= lr * (grad(i) / n + l2 * w(i))
    }
    w
  }
}
