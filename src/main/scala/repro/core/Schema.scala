package repro.core

import org.apache.spark.sql.types.{ArrayType, DataType, MapType, StructType}

/** A flattened schema set, as used throughout the R2D2 pipeline (§4.1 step 1).
  *
  * For flat schemas this is just the set of column names; for tree schemas
  * (typical of enterprise workloads) the tree is flattened so tokens are
  * distinct — a root `product` with children `price` and `id` becomes
  * `{product.price, product.id}`.
  */
final case class SchemaSet(tokens: Set[String]) {
  def size: Int = tokens.size

  /** Exact schema containment: every token of this schema appears in `other`. */
  def subsetOf(other: SchemaSet): Boolean = tokens.subsetOf(other.tokens)

  def intersect(other: SchemaSet): SchemaSet = SchemaSet(tokens.intersect(other.tokens))

  /** Schema-level containment fraction CM(this, other) = |this ∩ other| / |this|. */
  def containmentFraction(other: SchemaSet): Double =
    if (tokens.isEmpty) 1.0 else tokens.count(other.tokens.contains).toDouble / tokens.size
}

object SchemaSet {
  def apply(tokens: Iterable[String]): SchemaSet = SchemaSet(tokens.toSet)

  /** Flatten a (possibly nested) Spark schema into dotted tokens.
    *
    * Struct fields recurse with a `parent.child` prefix; array-of-struct
    * elements flatten through the array (the element schema is what matters
    * for containment); other types contribute their own path.
    */
  def fromStruct(schema: StructType): SchemaSet = {
    def flatten(prefix: String, dt: DataType): Seq[String] = dt match {
      case st: StructType =>
        st.fields.toSeq.flatMap { f =>
          val path = if (prefix.isEmpty) f.name else s"$prefix.${f.name}"
          flatten(path, f.dataType)
        }
      case at: ArrayType => flatten(prefix, at.elementType)
      case mt: MapType   => flatten(prefix, mt.valueType)
      case _             => Seq(prefix)
    }
    SchemaSet(flatten("", schema).toSet)
  }
}
