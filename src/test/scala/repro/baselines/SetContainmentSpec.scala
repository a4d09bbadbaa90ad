package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import repro.core.{GroundTruth, TableData}

class SetContainmentSpec extends AnyFunSuite {

  private def table(name: String, cols: Seq[String], rows: Seq[Seq[String]]): TableData =
    TableData(name, cols, rows.map(_.toArray).toArray)

  test("paper footnote 6: column-wise set containment falsely claims table containment") {
    // Table 1: (June, 20), (May, 12). Table 2: (June, 12), (May, 20).
    val t1 = table("t1", Seq("month", "day"), Seq(Seq("June", "20"), Seq("May", "12")))
    val t2 = table("t2", Seq("month", "day"), Seq(Seq("June", "12"), Seq("May", "20")))
    assert(SetContainment.columnsAsSets(t1, t2), "column sets are mutually contained")
    // …but true row-tuple containment does not hold:
    assert(GroundTruth.containmentFraction(t1, t2) == 0.0)
  }

  test("columns-as-sets is correct when real containment holds") {
    val parent = table("p", Seq("a", "b"), Seq(Seq("1", "x"), Seq("2", "y"), Seq("3", "z")))
    val child = table("c", Seq("a", "b"), Seq(Seq("1", "x")))
    assert(SetContainment.columnsAsSets(child, parent))
  }

  test("rows-as-sets cannot detect containment across different column counts (false negative)") {
    val parent = table("p", Seq("a", "b", "c"), Seq(Seq("1", "x", "q"), Seq("2", "y", "r")))
    val child = table("c", Seq("a", "b"), Seq(Seq("1", "x")))
    // Ground truth: the child IS contained in the parent's projection…
    assert(GroundTruth.containmentFraction(child, parent) == 1.0)
    // …but the rows-as-sets baseline structurally cannot see it.
    assert(!SetContainment.rowsAsSets(child, parent))
  }

  test("rows-as-sets works only in the same-schema case") {
    val parent = table("p", Seq("a", "b"), Seq(Seq("1", "x"), Seq("2", "y")))
    val child = table("c", Seq("a", "b"), Seq(Seq("2", "y")))
    assert(SetContainment.rowsAsSets(child, parent))
    val notContained = table("n", Seq("a", "b"), Seq(Seq("9", "9")))
    assert(!SetContainment.rowsAsSets(notContained, parent))
  }

  test("columns-as-sets with no shared columns is false") {
    val a = table("a", Seq("x"), Seq(Seq("1")))
    val b = table("b", Seq("y"), Seq(Seq("1")))
    assert(!SetContainment.columnsAsSets(a, b))
  }
}
