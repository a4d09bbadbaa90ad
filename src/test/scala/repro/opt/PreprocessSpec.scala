package repro.opt

import org.scalatest.funsuite.AnyFunSuite

import repro.core.{ContainmentGraph, Edge}

class PreprocessSpec extends AnyFunSuite {

  private val cm = CostModel.azureHotLike
  private val GB = 1024.0 * 1024 * 1024

  private val g = ContainmentGraph(
    Seq("root", "mid", "leaf", "other"),
    Seq(Edge("root", "mid"), Edge("mid", "leaf"), Edge("root", "other")),
  )
  private val sizes = Map("root" -> 10 * GB, "mid" -> 5 * GB, "leaf" -> 1 * GB, "other" -> 2 * GB)
  private val rows = Map("root" -> 1000L, "mid" -> 500L, "leaf" -> 100L, "other" -> 200L)

  private def build(known: Edge => Boolean, th: Double) = Preprocess.buildProblem(
    g, sizes, rows, known,
    accesses = Map("leaf" -> 1.0), maintenance = Map("root" -> 4.0),
    cm = cm, latencyThreshold = th,
  )

  test("all edges survive with permissive threshold and all transformations known") {
    val p = build(_ => true, th = 1e9)
    assert(p.edges.size == 3)
    assert(p.nodes.size == 4)
  }

  test("unknown transformations are pruned (§5.1)") {
    val p = build(e => e.child != "other", th = 1e9)
    assert(p.edges.map(e => (e.parent, e.child)).toSet == Set("root" -> "mid", "mid" -> "leaf"))
  }

  test("latency threshold prunes slow reconstructions") {
    // root→mid reads 10 GB + writes 5 GB ≈ 51 + 51 s at the model's rates;
    // a 60 s threshold keeps only the smaller edges.
    val p = build(_ => true, th = 60.0)
    assert(!p.edges.exists(e => e.parent == "root" && e.child == "mid"))
    assert(p.edges.exists(e => e.parent == "mid" && e.child == "leaf"))
  }

  test("reconstruction cost follows C_e = r·s_p + w·s_q") {
    val p = build(_ => true, th = 1e9)
    val e = p.edges.find(x => x.parent == "root" && x.child == "mid").get
    val expected = cm.readPerByte * sizes("root") + cm.writePerByte * sizes("mid")
    assert(math.abs(e.reconCost - expected) < 1e-9)
  }

  test("write cost dominates the reconstruction cost (order-of-magnitude gap)") {
    assert(cm.writePerByte / cm.readPerByte >= 10.0)
  }

  test("node attributes carried through: sizes, rows, accesses, maintenance") {
    val p = build(_ => true, th = 1e9)
    val leaf = p.nodes.find(_.name == "leaf").get
    assert(leaf.sizeBytes == sizes("leaf") && leaf.rowCount == 100L && leaf.accessesPerMonth == 1.0)
    val root = p.nodes.find(_.name == "root").get
    assert(root.maintPerMonth == 4.0)
  }

  test("provenanceKnown accepts direct and composed paths, both directions") {
    val known = Preprocess.provenanceKnown(Seq("a" -> "b", "b" -> "c"))
    assert(known(Edge("a", "b")))  // direct
    assert(known(Edge("a", "c")))  // composed a→b→c
    assert(known(Edge("c", "a")))  // reverse (add-rows style containment)
    assert(!known(Edge("a", "z"))) // unrelated
  }

  test("powerLaw is deterministic, positive, and heavy-tailed") {
    val names = (0 until 2000).map(i => s"d$i")
    val a = Preprocess.powerLaw(names, seed = 5)
    val b = Preprocess.powerLaw(names, seed = 5)
    assert(a == b)
    assert(a.values.forall(_ >= 0.5))
    val vs = a.values.toSeq.sorted
    // Heavy tail: max far above median.
    assert(vs.last > 5 * vs(vs.size / 2))
  }
}
