package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.stats.{DatasetStats, NumStats, StrStats}

import scala.util.Random

class MMPSpec extends AnyFunSuite {

  private def ds(cols: (String, Any)*): DatasetStats =
    DatasetStats(100, 1000, cols.map {
      case (n, (lo: Double, hi: Double)) => n -> NumStats(lo, hi)
      case (n, (lo: String, hi: String)) => n -> StrStats(lo, hi)
      case (n, s: NumStats)              => n -> s
      case other                         => throw new IllegalArgumentException(other.toString)
    }.toMap)

  test("child range inside parent range does not violate") {
    val parent = ds("x" -> (0.0, 100.0))
    val child = ds("x" -> (10.0, 90.0))
    assert(!MMP.violates(parent, child))
  }

  test("child min below parent min violates") {
    assert(MMP.violates(ds("x" -> (10.0, 100.0)), ds("x" -> (5.0, 90.0))))
  }

  test("child max above parent max violates") {
    assert(MMP.violates(ds("x" -> (0.0, 50.0)), ds("x" -> (10.0, 90.0))))
  }

  test("identical ranges do not violate (duplicates must survive)") {
    assert(!MMP.violates(ds("x" -> (3.0, 7.0)), ds("x" -> (3.0, 7.0))))
  }

  test("violation on any single common column suffices") {
    val parent = ds("x" -> (0.0, 100.0), "y" -> (0.0, 10.0))
    val child = ds("x" -> (10.0, 90.0), "y" -> (0.0, 20.0))
    assert(MMP.violates(parent, child))
  }

  test("non-common columns are ignored") {
    val parent = ds("x" -> (0.0, 100.0), "only_parent" -> (0.0, 1.0))
    val child = ds("x" -> (1.0, 99.0), "only_child" -> (-50.0, 50.0))
    assert(!MMP.violates(parent, child))
  }

  test("string stats prune lexicographically") {
    assert(MMP.violates(ds("s" -> ("b", "m")), ds("s" -> ("a", "m"))))
    assert(!MMP.violates(ds("s" -> ("a", "z")), ds("s" -> ("b", "m"))))
  }

  test("string stats can be disabled") {
    val parent = ds("s" -> ("b", "m"))
    val child = ds("s" -> ("a", "m"))
    assert(!MMP.violates(parent, child, useStringStats = false))
  }

  test("mixed stat kinds on the same column never prune (cannot compare safely)") {
    val parent = ds("x" -> ("a", "z"))
    val child = ds("x" -> (0.0, 1.0))
    assert(!MMP.violates(parent, child))
  }

  test("prune removes exactly the violating edges and counts one op per edge") {
    val stats = Map(
      "p" -> ds("x" -> (0.0, 100.0)),
      "good" -> ds("x" -> (10.0, 90.0)),
      "bad" -> ds("x" -> (-5.0, 90.0)),
    )
    val g = ContainmentGraph(stats.keys, Seq(Edge("p", "good"), Edge("p", "bad")))
    val res = MMP.prune(g, stats(_))
    assert(res.pruned == Set(Edge("p", "bad")))
    assert(res.graph.edges == Set(Edge("p", "good")))
    assert(res.opCount == 2)
  }

  /** Safety property: if the child's values are truly a subset of the
    * parent's per column, MMP can never prune — randomized over synthetic
    * column ranges.
    */
  for (trial <- 0 until 20) {
    test(s"MMP never prunes a true containment (trial $trial)") {
      val rng = new Random(500 + trial)
      val cols = (0 until 1 + rng.nextInt(5)).map(i => s"c$i")
      val parentRanges = cols.map { c =>
        val lo = rng.nextDouble() * 100
        c -> (lo, lo + rng.nextDouble() * 100)
      }
      // Child range drawn strictly inside the parent's.
      val childRanges = parentRanges.map { case (c, (lo, hi)) =>
        val a = lo + rng.nextDouble() * (hi - lo) / 2
        val b = hi - rng.nextDouble() * (hi - lo) / 2
        c -> (math.min(a, b), math.max(a, b))
      }
      assert(!MMP.violates(ds(parentRanges: _*), ds(childRanges: _*)))
    }
  }
}
