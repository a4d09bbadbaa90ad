package repro.core

import org.apache.spark.sql.types._
import org.scalatest.funsuite.AnyFunSuite

class SchemaSpec extends AnyFunSuite {

  test("flat schema flattens to its column names") {
    val st = StructType(Seq(StructField("a", IntegerType), StructField("b", StringType)))
    assert(SchemaSet.fromStruct(st).tokens == Set("a", "b"))
  }

  test("tree schema flattens to dotted tokens (paper §4.1 example)") {
    val st = StructType(Seq(
      StructField("product", StructType(Seq(
        StructField("price", DoubleType),
        StructField("id", LongType),
      )))))
    assert(SchemaSet.fromStruct(st).tokens == Set("product.price", "product.id"))
  }

  test("deeply nested structs flatten through every level") {
    val st = StructType(Seq(
      StructField("a", StructType(Seq(
        StructField("b", StructType(Seq(StructField("c", IntegerType)))),
        StructField("d", StringType),
      )))))
    assert(SchemaSet.fromStruct(st).tokens == Set("a.b.c", "a.d"))
  }

  test("array of struct flattens via its element schema") {
    val st = StructType(Seq(
      StructField("xs", ArrayType(StructType(Seq(StructField("y", IntegerType)))))))
    assert(SchemaSet.fromStruct(st).tokens == Set("xs.y"))
  }

  test("map value type flattens via its value schema") {
    val st = StructType(Seq(
      StructField("m", MapType(StringType, StructType(Seq(StructField("v", DoubleType)))))))
    assert(SchemaSet.fromStruct(st).tokens == Set("m.v"))
  }

  test("scalar array contributes its own path") {
    val st = StructType(Seq(StructField("xs", ArrayType(IntegerType))))
    assert(SchemaSet.fromStruct(st).tokens == Set("xs"))
  }

  test("subsetOf is exact containment") {
    assert(SchemaSet(Set("a", "b")).subsetOf(SchemaSet(Set("a", "b", "c"))))
    assert(!SchemaSet(Set("a", "z")).subsetOf(SchemaSet(Set("a", "b", "c"))))
    assert(SchemaSet(Set("a")).subsetOf(SchemaSet(Set("a"))))
  }

  test("empty schema is contained in anything") {
    assert(SchemaSet(Set.empty[String]).subsetOf(SchemaSet(Set("a"))))
  }

  test("containmentFraction matches |A ∩ B| / |A|") {
    val a = SchemaSet(Set("a", "b", "c", "d"))
    val b = SchemaSet(Set("b", "c", "x"))
    assert(a.containmentFraction(b) == 0.5)
    assert(b.containmentFraction(a) == 2.0 / 3.0)
  }

  test("containmentFraction is 1 for full containment and for empty schema") {
    val a = SchemaSet(Set("a"))
    assert(a.containmentFraction(SchemaSet(Set("a", "b"))) == 1.0)
    assert(SchemaSet(Set.empty[String]).containmentFraction(a) == 1.0)
  }

  test("intersect returns shared tokens") {
    assert(SchemaSet(Set("a", "b")).intersect(SchemaSet(Set("b", "c"))).tokens == Set("b"))
  }

  test("size is token cardinality") {
    assert(SchemaSet(Set("a", "b", "c")).size == 3)
  }
}
