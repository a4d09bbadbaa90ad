package repro.core

import org.scalatest.funsuite.AnyFunSuite

class GroundTruthSpec extends AnyFunSuite {

  private def table(name: String, cols: Seq[String], rows: Seq[Seq[String]]): TableData =
    TableData(name, cols, rows.map(_.toArray).toArray)

  test("schemaGraph performs exactly C(N,2) comparisons") {
    val ds = (0 until 7).map(i => s"T$i" -> SchemaSet(Set(s"c$i", "shared")))
    val (_, ops) = GroundTruth.schemaGraph(ds)
    assert(ops == 21)
  }

  test("schemaGraph adds both directions for equal schemas") {
    val ds = Seq("a" -> SchemaSet(Set("x")), "b" -> SchemaSet(Set("x")))
    val (g, _) = GroundTruth.schemaGraph(ds)
    assert(g.edges == Set(Edge("a", "b"), Edge("b", "a")))
  }

  test("containmentFraction: full containment via projection") {
    val parent = table("p", Seq("a", "b", "c"), Seq(Seq("1", "x", "m"), Seq("2", "y", "n")))
    val child = table("c", Seq("a", "b"), Seq(Seq("1", "x"), Seq("2", "y")))
    assert(GroundTruth.containmentFraction(child, parent) == 1.0)
  }

  test("containmentFraction: partial containment is the contained fraction of distinct rows") {
    val parent = table("p", Seq("a"), Seq(Seq("1"), Seq("2")))
    val child = table("c", Seq("a"), Seq(Seq("1"), Seq("3"), Seq("4"), Seq("2")))
    assert(GroundTruth.containmentFraction(child, parent) == 0.5)
  }

  test("containmentFraction: column order does not matter (row tuples, not positions)") {
    val parent = table("p", Seq("b", "a"), Seq(Seq("x", "1")))
    val child = table("c", Seq("a", "b"), Seq(Seq("1", "x")))
    assert(GroundTruth.containmentFraction(child, parent) == 1.0)
  }

  test("containmentFraction: duplicates in the child count once (distinct-row semantics)") {
    val parent = table("p", Seq("a"), Seq(Seq("1")))
    val child = table("c", Seq("a"), Seq(Seq("1"), Seq("1"), Seq("1")))
    assert(GroundTruth.containmentFraction(child, parent) == 1.0)
  }

  test("containmentFraction: footnote-6 tables are mutually non-contained") {
    val t1 = table("t1", Seq("m", "d"), Seq(Seq("June", "20"), Seq("May", "12")))
    val t2 = table("t2", Seq("m", "d"), Seq(Seq("June", "12"), Seq("May", "20")))
    assert(GroundTruth.containmentFraction(t1, t2) == 0.0)
    assert(GroundTruth.containmentFraction(t2, t1) == 0.0)
  }

  test("empty child is trivially contained") {
    val parent = table("p", Seq("a"), Seq(Seq("1")))
    val child = table("c", Seq("a"), Seq.empty)
    assert(GroundTruth.containmentFraction(child, parent) == 1.0)
  }

  test("projectedKeys separates values with a control character (no concat collisions)") {
    val t = table("t", Seq("a", "b"), Seq(Seq("ab", "c"), Seq("a", "bc")))
    assert(t.projectedKeys(Seq("a", "b")).size == 2)
  }

  test("projectedKeys rejects unknown columns") {
    val t = table("t", Seq("a"), Seq(Seq("1")))
    intercept[IllegalArgumentException](t.projectedKeys(Seq("zzz")))
  }

  test("contentGraph keeps only CM=1 edges and accumulates Σ MiMj ops") {
    val p = table("p", Seq("a"), Seq(Seq("1"), Seq("2"), Seq("3")))
    val cIn = table("cIn", Seq("a"), Seq(Seq("1"), Seq("2")))
    val cOut = table("cOut", Seq("a"), Seq(Seq("1"), Seq("9")))
    val data = Map("p" -> p, "cIn" -> cIn, "cOut" -> cOut)
    val sg = ContainmentGraph(data.keys, Seq(Edge("p", "cIn"), Edge("p", "cOut")))
    val gt = GroundTruth.contentGraph(sg, data(_))
    assert(gt.graph.edges == Set(Edge("p", "cIn")))
    assert(gt.fractions(Edge("p", "cOut")) == 0.5)
    assert(gt.pairwiseOps == 3L * 2 + 3L * 2)
  }
}
