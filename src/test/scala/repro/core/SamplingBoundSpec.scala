package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class SamplingBoundSpec extends AnyFunSuite {

  test("paper example: eps=0.1, delta=0.05 needs 29 samples") {
    assert(SamplingBound.nSamples(0.1, 0.05) == 29)
  }

  test("more containment (smaller eps) needs more samples") {
    assert(SamplingBound.nSamples(0.01, 0.05) > SamplingBound.nSamples(0.1, 0.05))
    assert(SamplingBound.nSamples(0.1, 0.05) > SamplingBound.nSamples(0.5, 0.05))
  }

  test("higher confidence (smaller delta) needs more samples") {
    assert(SamplingBound.nSamples(0.1, 0.01) > SamplingBound.nSamples(0.1, 0.1))
  }

  test("bound inputs are validated") {
    intercept[IllegalArgumentException](SamplingBound.nSamples(0.0, 0.05))
    intercept[IllegalArgumentException](SamplingBound.nSamples(1.0, 0.05))
    intercept[IllegalArgumentException](SamplingBound.nSamples(0.1, 0.0))
    intercept[IllegalArgumentException](SamplingBound.nSamples(0.1, 1.0))
  }

  test("missProbability is (1-eps)^n") {
    assert(math.abs(SamplingBound.missProbability(0.1, 29) - math.pow(0.9, 29)) < 1e-12)
    assert(SamplingBound.missProbability(0.1, 29) <= 0.05)
  }

  test("the bound is tight-ish: one fewer sample can exceed delta") {
    val n = SamplingBound.nSamples(0.1, 0.05)
    assert(SamplingBound.missProbability(0.1, n) <= 0.05)
    assert(SamplingBound.missProbability(0.1, n - 2) > 0.05)
  }

  /** Empirical check of Theorem 4.2: simulate sampling from a dataset with
    * containment 1−ε and count how often n_s samples all land in the
    * contained part (the failure case). The failure rate must be ≤ δ up to
    * Monte-Carlo noise.
    */
  for ((eps, delta) <- Seq((0.1, 0.05), (0.3, 0.1), (0.05, 0.2))) {
    test(s"empirical failure rate respects the bound (eps=$eps, delta=$delta)") {
      val n = SamplingBound.nSamples(eps, delta)
      val rng = new Random(42)
      val trials = 4000
      val failures = (0 until trials).count { _ =>
        (0 until n).forall(_ => rng.nextDouble() < 1 - eps)
      }
      val rate = failures.toDouble / trials
      assert(rate <= delta + 0.02, s"failure rate $rate exceeds delta=$delta")
    }
  }
}
