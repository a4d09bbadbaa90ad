package repro.exp

import org.scalatest.funsuite.AnyFunSuite

class TextTableSpec extends AnyFunSuite {

  test("columns are padded to the widest cell") {
    val t = TextTable.format(Seq("name", "n"), Seq(Seq("a", 1), Seq("longer", 22)))
    val lines = t.split("\n")
    assert(lines.forall(_.length == lines.head.length))
    assert(lines(0).contains("name") && lines(2).contains("a"))
  }

  test("separator row uses dashes") {
    val t = TextTable.format(Seq("x"), Seq(Seq("y")))
    assert(t.split("\n")(1).forall(c => c == '-' || c == '|'))
  }

  test("section wraps a title") {
    val s = TextTable.section("Title", "body")
    assert(s.contains("== Title ==") && s.contains("body"))
  }

  test("non-string cells are rendered via String.valueOf") {
    val t = TextTable.format(Seq("v"), Seq(Seq(3.5), Seq(null)))
    assert(t.contains("3.5") && t.contains("null"))
  }
}
