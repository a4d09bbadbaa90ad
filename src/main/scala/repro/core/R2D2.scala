package repro.core

import org.apache.spark.sql.DataFrame

import repro.stats.StatsCatalog

/** Mutable-free snapshot of a full R2D2 run over a set of datasets. */
final case class R2D2Run(
    schemas: Map[String, SchemaSet],
    catalog: StatsCatalog,
    sgb: SGBResult,
    mmp: MMPResult,
    clp: CLPResult,
) {
  /** The final containment graph: an edge parent → child asserts, with high
    * probability, that the child is fully contained in the parent.
    */
  def containmentGraph: ContainmentGraph = clp.graph
}

/** The three-step hierarchical R2D2 pipeline (§4): SGB → MMP → CLP.
  *
  * Each step only ever *removes* candidate edges, and none can remove a true
  * containment edge (Theorem 4.1 for SGB; exact stats for MMP; sampling from
  * the child for CLP) — so recall is preserved end to end while the incorrect
  * edge count shrinks at every stage.
  */
object R2D2 {

  def run(datasets: Seq[(String, DataFrame)], clpCfg: CLPConfig = CLPConfig()): R2D2Run = {
    val flat = datasets.map { case (n, df) => n -> StatsCatalog.flatten(df) }
    val schemas = flat.map { case (n, df) => n -> SchemaSet.fromStruct(df.schema) }
    val catalog = new StatsCatalog
    flat.foreach { case (n, df) => catalog.ingest(n, df) }
    val sgb = SGB.build(schemas)
    val mmp = MMP.prune(sgb.graph, catalog(_))
    val dfMap = flat.toMap
    val clp = CLP.prune(mmp.graph, dfMap(_), schemas.toMap, clpCfg)
    R2D2Run(schemas.toMap, catalog, sgb, mmp, clp)
  }
}
