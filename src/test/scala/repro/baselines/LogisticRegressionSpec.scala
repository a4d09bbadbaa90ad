package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class LogisticRegressionSpec extends AnyFunSuite {

  test("sigmoid is centred and bounded") {
    assert(LogisticRegression.sigmoid(0.0) == 0.5)
    assert(LogisticRegression.sigmoid(100.0) > 0.999)
    assert(LogisticRegression.sigmoid(-100.0) < 0.001)
  }

  test("learns a linearly separable 1-D threshold") {
    val xs = (0 until 100).map(i => Array(i / 100.0)).toArray
    val ys = (0 until 100).map(i => if (i >= 50) 1 else 0).toArray
    val w = LogisticRegression.train(xs, ys, epochs = 2000, lr = 1.0)
    val acc = xs.indices.count(i => (LogisticRegression.predict(w, xs(i)) >= 0.5) == (ys(i) == 1))
    assert(acc >= 95, s"accuracy $acc/100")
  }

  test("learns a 2-D separable problem") {
    val rng = new Random(5)
    val xs = Array.fill(200)(Array(rng.nextDouble() * 2 - 1, rng.nextDouble() * 2 - 1))
    val ys = xs.map(x => if (x(0) + x(1) > 0) 1 else 0)
    val w = LogisticRegression.train(xs, ys, epochs = 2000, lr = 1.0)
    val acc = xs.indices.count(i => (LogisticRegression.predict(w, xs(i)) >= 0.5) == (ys(i) == 1))
    assert(acc >= 190, s"accuracy $acc/200")
  }

  test("training is deterministic") {
    val xs = Array(Array(0.1), Array(0.9))
    val ys = Array(0, 1)
    assert(LogisticRegression.train(xs, ys).toSeq == LogisticRegression.train(xs, ys).toSeq)
  }

  test("mismatched inputs are rejected") {
    intercept[IllegalArgumentException](LogisticRegression.train(Array(Array(1.0)), Array(0, 1)))
    intercept[IllegalArgumentException](LogisticRegression.train(Array.empty, Array.empty))
  }
}
