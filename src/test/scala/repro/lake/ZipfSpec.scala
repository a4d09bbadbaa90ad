package repro.lake

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class ZipfSpec extends AnyFunSuite {

  test("samples are always in [1, n]") {
    val z = new Zipf(10)
    val rng = new Random(1)
    (0 until 2000).foreach { _ =>
      val s = z.sample(rng)
      assert(s >= 1 && s <= 10)
    }
  }

  test("rank 1 is the most frequent (skew)") {
    val z = new Zipf(10, 1.5)
    val rng = new Random(2)
    val counts = Seq.fill(20000)(z.sample(rng)).groupBy(identity).view.mapValues(_.size).toMap
    assert(counts(1) > counts.getOrElse(2, 0))
    assert(counts(1) > 3 * counts.getOrElse(5, 1))
  }

  test("higher alpha concentrates more mass on rank 1") {
    val rng1 = new Random(3); val rng2 = new Random(3)
    val flat = Seq.fill(20000)(new Zipf(10, 0.5).sample(rng1)).count(_ == 1)
    val steep = Seq.fill(20000)(new Zipf(10, 2.5).sample(rng2)).count(_ == 1)
    assert(steep > flat)
  }

  test("n=1 always returns rank 1") {
    val z = new Zipf(1)
    val rng = new Random(4)
    (0 until 100).foreach(_ => assert(z.sample(rng) == 1))
  }

  test("deterministic under a fixed RNG seed") {
    val z = new Zipf(8, 1.2)
    val a = { val r = new Random(9); Seq.fill(100)(z.sample(r)) }
    val b = { val r = new Random(9); Seq.fill(100)(z.sample(r)) }
    assert(a == b)
  }

  test("zero or negative n is rejected") {
    intercept[IllegalArgumentException](new Zipf(0))
  }
}
