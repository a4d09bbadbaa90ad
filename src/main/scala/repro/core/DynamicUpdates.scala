package repro.core

import org.apache.spark.sql.DataFrame

import repro.stats.StatsCatalog

/** Incremental state for §7.1 dynamic graph updates. */
final case class R2D2State(
    dfs: Map[String, DataFrame],
    schemas: Map[String, SchemaSet],
    catalog: StatsCatalog,
    clusters: Seq[SGBResult.Cluster],
    graph: ContainmentGraph,
)

object R2D2State {
  def fromRun(datasets: Map[String, DataFrame], run: R2D2Run): R2D2State =
    R2D2State(datasets, run.schemas, run.catalog, run.sgb.clusters, run.containmentGraph)
}

/** Dynamic updates (§7.1) — each operation is linear in the number of
  * datasets, as the paper argues, instead of re-running the whole pipeline.
  */
object DynamicUpdates {

  /** Check one candidate directed edge parent → child with MMP then CLP. */
  private def candidateSurvives(st: R2D2State, parent: String, child: String, cfg: CLPConfig): Boolean = {
    if (MMP.violates(st.catalog(parent), st.catalog(child))) false
    else {
      val e = Edge(parent, child)
      val (doPrune, _, _) =
        CLP.checkEdge(e, st.dfs(parent), st.dfs(child), st.schemas(parent), st.schemas(child), cfg)
      !doPrune
    }
  }

  /** Add a new dataset: place it in the SGB clustering (new member of every
    * containing center, or a new center), probe candidate edges against its
    * cluster co-members with MMP + CLP, and splice the survivors in.
    * Returns the updated state and the number of datasets examined.
    */
  def addDataset(st0: R2D2State, name: String, df: DataFrame, cfg: CLPConfig = CLPConfig()): (R2D2State, Long) = {
    require(!st0.dfs.contains(name), s"dataset $name already present")
    val flat = StatsCatalog.flatten(df)
    val schema = SchemaSet.fromStruct(flat.schema)
    st0.catalog.ingest(name, flat)
    var st = st0.copy(
      dfs = st0.dfs + (name -> flat),
      schemas = st0.schemas + (name -> schema),
      graph = st0.graph.addNode(name),
    )
    var examined = 0L

    val containingCenters = st.clusters.filter { c => examined += 1; schema.subsetOf(st.schemas(c.center)) }
    val (clusters, candidates) =
      if (containingCenters.nonEmpty) {
        val updated = st.clusters.map { c =>
          if (containingCenters.exists(_.center == c.center)) c.copy(members = c.members :+ name) else c
        }
        (updated, containingCenters.flatMap(_.members).distinct)
      } else {
        // New center: every dataset contained in it becomes a member — one
        // linear pass over all datasets (§7.1).
        val members = st0.schemas.keys.toSeq.sorted.filter { other =>
          examined += 1
          st.schemas(other).subsetOf(schema)
        }
        (st.clusters :+ SGBResult.Cluster(name, name +: members), members)
      }

    var g = st.graph
    for (other <- candidates if other != name) {
      val so = st.schemas(other)
      if (schema.subsetOf(so) && candidateSurvives(st.copy(clusters = clusters), other, name, cfg))
        g = g.addEdge(Edge(other, name))
      if (so.subsetOf(schema) && candidateSurvives(st.copy(clusters = clusters), name, other, cfg))
        g = g.addEdge(Edge(name, other))
    }
    (st.copy(clusters = clusters, graph = g), examined)
  }

  /** Delete a dataset: drop its node, incident edges and cluster slots. */
  def deleteDataset(st: R2D2State, name: String): R2D2State = {
    st.catalog.remove(name)
    st.copy(
      dfs = st.dfs - name,
      schemas = st.schemas - name,
      clusters = st.clusters
        .map(c => c.copy(members = c.members.filterNot(_ == name)))
        .filterNot(c => c.center == name), // conservatively drop the cluster; members remain reachable via other clusters or re-add
      graph = st.graph.removeNode(name),
    )
  }

  /** Rows were added to `name`: outgoing edges (children contained in it)
    * still hold; every incoming edge and previously-absent potential parent
    * must be rechecked — linear in the dataset count.
    */
  def rowsAdded(st0: R2D2State, name: String, newDf: DataFrame, cfg: CLPConfig = CLPConfig()): (R2D2State, Long) =
    refreshOneSide(st0, name, newDf, cfg, incomingSide = true)

  /** Rows were removed from `name`: incoming edges still hold; outgoing edges
    * must be rechecked — linear in the dataset count.
    */
  def rowsRemoved(st0: R2D2State, name: String, newDf: DataFrame, cfg: CLPConfig = CLPConfig()): (R2D2State, Long) =
    refreshOneSide(st0, name, newDf, cfg, incomingSide = false)

  private def refreshOneSide(
      st0: R2D2State,
      name: String,
      newDf: DataFrame,
      cfg: CLPConfig,
      incomingSide: Boolean,
  ): (R2D2State, Long) = {
    require(st0.dfs.contains(name), s"unknown dataset $name")
    val flat = StatsCatalog.flatten(newDf)
    st0.catalog.ingest(name, flat)
    val st = st0.copy(dfs = st0.dfs + (name -> flat))
    val schema = st.schemas(name)
    var examined = 0L
    var edges = st.graph.edges.filterNot(e => if (incomingSide) e.child == name else e.parent == name)
    for (other <- st.schemas.keys.toSeq.sorted if other != name) {
      examined += 1
      val so = st.schemas(other)
      if (incomingSide) {
        if (schema.subsetOf(so) && candidateSurvives(st, other, name, cfg)) edges += Edge(other, name)
      } else {
        if (so.subsetOf(schema) && candidateSurvives(st, name, other, cfg)) edges += Edge(name, other)
      }
    }
    (st.copy(graph = ContainmentGraph(st.graph.nodes, edges)), examined)
  }
}
