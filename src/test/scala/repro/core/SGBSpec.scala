package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class SGBSpec extends AnyFunSuite {

  private def s(tokens: String*): SchemaSet = SchemaSet(tokens.toSet)

  /** The worked example of Fig. 3: six schemas over columns c1..c5. */
  private val fig3 = Seq(
    "S1" -> s("c1", "c2", "c3", "c4"),
    "S2" -> s("c1", "c2", "c5"),
    "S3" -> s("c1", "c2"),
    "S4" -> s("c2", "c3"),
    "S5" -> s("c1"),
    "S6" -> s("c5"),
  )

  test("fig-3-like example: all ground truth edges found") {
    val result = SGB.build(fig3)
    val (gt, _) = GroundTruth.schemaGraph(fig3)
    assert(gt.edges.subsetOf(result.graph.edges))
  }

  test("fig-3-like example: largest schema becomes the first center") {
    val result = SGB.build(fig3)
    assert(result.clusters.head.center == "S1")
  }

  test("a schema contained in two centers joins both clusters") {
    val result = SGB.build(fig3)
    // S3 ⊆ S1 and S3 ⊆ S2, both of which are centers.
    val holding = result.clusters.filter(_.members.contains("S3")).map(_.center)
    assert(holding.toSet == Set("S1", "S2"))
  }

  test("centers are members of their own cluster") {
    val result = SGB.build(fig3)
    result.clusters.foreach(c => assert(c.members.contains(c.center)))
  }

  test("equal schemas produce edges in both directions (duplicate capture)") {
    val result = SGB.build(Seq("A" -> s("x", "y"), "B" -> s("x", "y")))
    assert(result.graph.edges == Set(Edge("A", "B"), Edge("B", "A")))
  }

  test("disjoint schemas produce no edges and separate clusters") {
    val result = SGB.build(Seq("A" -> s("x"), "B" -> s("y")))
    assert(result.graph.edges.isEmpty)
    assert(result.clusters.size == 2)
  }

  test("duplicate dataset names are rejected") {
    intercept[IllegalArgumentException](SGB.build(Seq("A" -> s("x"), "A" -> s("y"))))
  }

  test("empty input builds an empty graph") {
    val result = SGB.build(Seq.empty)
    assert(result.graph.nodes.isEmpty && result.graph.edges.isEmpty)
  }

  test("single dataset builds a single cluster, no edges") {
    val result = SGB.build(Seq("A" -> s("x", "y")))
    assert(result.clusters.map(_.center) == Seq("A"))
    assert(result.graph.edges.isEmpty)
  }

  test("edge direction is from larger schema to smaller") {
    val result = SGB.build(Seq("big" -> s("a", "b", "c"), "small" -> s("a", "b")))
    assert(result.graph.edges == Set(Edge("big", "small")))
  }

  test("op counters are consistent with cluster structure") {
    val result = SGB.build(fig3)
    val pairSum = result.clusters.map(c => c.members.size.toLong * (c.members.size - 1) / 2).sum
    assert(result.pairChecks == pairSum)
    assert(result.centerChecks >= fig3.size - 1) // every non-first schema checks ≥1 center
    assert(result.totalOps(fig3.size) > 0)
  }

  /** Theorem 4.1, randomized: SGB recall is always 100% vs brute force. */
  for (trial <- 0 until 25) {
    test(s"Theorem 4.1: no ground-truth schema edge is ever missed (trial $trial)") {
      val rng = new Random(1000 + trial)
      val vocab = (0 until 12).map(i => s"c$i")
      val n = 4 + rng.nextInt(12)
      val schemas = (0 until n).map { i =>
        val k = 1 + rng.nextInt(vocab.size)
        s"T$i" -> SchemaSet(rng.shuffle(vocab).take(k).toSet)
      }
      val result = SGB.build(schemas)
      val (gt, _) = GroundTruth.schemaGraph(schemas)
      val missed = gt.edges.diff(result.graph.edges)
      assert(missed.isEmpty, s"missed edges: $missed")
    }
  }

  /** SGB never invents edges: every edge it reports is a true schema edge. */
  for (trial <- 0 until 10) {
    test(s"SGB edges are always true schema-containment edges (trial $trial)") {
      val rng = new Random(2000 + trial)
      val vocab = (0 until 8).map(i => s"c$i")
      val schemas = (0 until 10).map { i =>
        s"T$i" -> SchemaSet(rng.shuffle(vocab).take(1 + rng.nextInt(vocab.size)).toSet)
      }
      val byName = schemas.toMap
      val result = SGB.build(schemas)
      result.graph.edges.foreach { e =>
        assert(byName(e.child).subsetOf(byName(e.parent)), s"bogus edge $e")
      }
    }
  }
}
