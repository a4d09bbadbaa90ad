package repro.core

import org.apache.spark.sql.DataFrame

/** A fully-materialized table for brute-force ground-truth computation:
  * canonical string values per cell, columns in schema-token order.
  */
final case class TableData(name: String, columns: Seq[String], rows: Array[Array[String]]) {
  lazy val schema: SchemaSet = SchemaSet(columns.toSet)
  def rowCount: Long = rows.length.toLong

  /** Distinct row keys projected onto `cols` (must be a subset of columns). */
  def projectedKeys(cols: Seq[String]): Set[String] = {
    val idx = cols.map { c =>
      val i = columns.indexOf(c)
      require(i >= 0, s"column $c not in ${name}")
      i
    }
    rows.iterator.map(r => idx.map(r).mkString("\u0001")).toSet
  }
}

object TableData {
  /** Canonical cell formatting — identical values collected twice must
    * stringify identically (they do: cells are copies, not recomputations).
    */
  def cell(v: Any): String = if (v == null) "∅" else v.toString

  def fromDf(name: String, df: DataFrame): TableData = {
    val cols = df.columns.toSeq
    val rows = df.collect().map(r => Array.tabulate(cols.size)(i => cell(r.get(i))))
    TableData(name, cols, rows)
  }
}

/** Brute-force ground truth (§6.2): all-pairs schema containment, then per
  * schema-edge full-content containment.
  *
  * The paper's brute force compares hashes of all row pairs (Σ MᵢMⱼ
  * operations, Table 3); we keep that as the *cost model* but execute with a
  * hash set per edge so ground truth is computable at all — the semantics
  * are identical. Containment is over distinct row tuples projected onto the
  * child's schema (Spark preserves neither row order nor multiplicity).
  */
object GroundTruth {

  /** All-pairs schema containment graph. Returns the graph and the number of
    * pairwise schema comparisons (the Table 3 `C(N,2)` cost).
    */
  def schemaGraph(datasets: Seq[(String, SchemaSet)]): (ContainmentGraph, Long) = {
    var ops = 0L
    val edges = Set.newBuilder[Edge]
    for (i <- datasets.indices; j <- datasets.indices if i < j) {
      ops += 1
      val (na, sa) = datasets(i)
      val (nb, sb) = datasets(j)
      if (sb.subsetOf(sa)) edges += Edge(na, nb)
      if (sa.subsetOf(sb)) edges += Edge(nb, na)
    }
    (ContainmentGraph(datasets.map(_._1), edges.result()), ops)
  }

  /** Containment fraction CM(child, parent) over the child's columns. */
  def containmentFraction(child: TableData, parent: TableData): Double = {
    val cols = child.columns.sorted
    val childKeys = child.projectedKeys(cols)
    if (childKeys.isEmpty) return 1.0
    val parentKeys = parent.projectedKeys(cols)
    childKeys.count(parentKeys.contains).toDouble / childKeys.size
  }

  final case class ContentGT(
      graph: ContainmentGraph,
      fractions: Map[Edge, Double],
      pairwiseOps: Long,
  )

  /** For every schema-graph edge, compute the true containment fraction and
    * keep the edge iff CM = 1. `pairwiseOps` accumulates the paper's
    * brute-force Σ MᵢMⱼ row-pair cost for Table 3.
    */
  def contentGraph(schemaGraph: ContainmentGraph, data: String => TableData): ContentGT = {
    var ops = 0L
    val fractions = schemaGraph.edges.toSeq.sortBy(e => (e.parent, e.child)).map { e =>
      val p = data(e.parent)
      val c = data(e.child)
      ops += p.rowCount * c.rowCount
      e -> containmentFraction(c, p)
    }.toMap
    val kept = schemaGraph.edges.filter(e => fractions(e) >= 1.0 - 1e-12)
    ContentGT(ContainmentGraph(schemaGraph.nodes, kept), fractions, ops)
  }
}
