package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import repro.stats.StatsCatalog.qcol

/** Parameters of content-level pruning (§4.3, §6.6).
  *
  * @param s               max number of search columns to sample WHERE-filters from
  * @param t               max rows sampled from the child per probe
  * @param seed            RNG seed; probes are deterministic in (seed, edge)
  * @param pivotCandidates how many leading child values to draw a pivot from
  * @param parentFiltered  if true, use the paper's two-sided variant: apply the
  *                        same WHERE filter on the parent and check containment
  *                        between the two samples (`s_A ⊆ s_B`), which holds iff
  *                        the filter is a WHERE predicate and `A ⊆ B`
  */
final case class CLPConfig(
    s: Int = 4,
    t: Int = 10,
    seed: Long = 42,
    pivotCandidates: Int = 64,
    parentFiltered: Boolean = false,
    parallelism: Int = 8,
)

/** Result of content-level pruning.
  *
  * @param probeCount  number of WHERE-filter probes executed
  * @param sampledRows total child rows drawn across all probes
  */
final case class CLPResult(
    graph: ContainmentGraph,
    pruned: Set[Edge],
    probeCount: Long,
    sampledRows: Long,
)

/** Algorithm 3 (CLP): for each surviving edge x → y, sample up to `t` rows of
  * the child y via a WHERE filter on each of `s` sampled common columns, and
  * left-anti join the sample against the parent x over **all** common columns
  * (the full row tuple — column-wise set containment is not enough, paper
  * footnote 6). Any sampled row missing from x disproves `y ⊆ x` and the
  * edge is pruned. True containment edges can never be pruned: every row of
  * y, sampled or not, is present in x.
  */
object CLP {

  /** Memo of pivot-candidate values per (dataset, column). A dataset's
    * leading values do not change between probes, so re-collecting them for
    * every edge that touches the dataset would only burn Spark jobs.
    * Thread-safe: probes run concurrently; a rare duplicate compute of the
    * same key is harmless (same deterministic value).
    */
  final class PivotCache {
    private val m = new java.util.concurrent.ConcurrentHashMap[(String, String), Array[Any]]()
    def candidates(dataset: String, column: String)(compute: => Array[Any]): Array[Any] = {
      val key = (dataset, column)
      val cached = m.get(key)
      if (cached != null) cached
      else {
        val v = compute
        m.putIfAbsent(key, v)
        m.get(key)
      }
    }
  }

  def prune(
      graph: ContainmentGraph,
      dfs: String => DataFrame,
      schemas: String => SchemaSet,
      cfg: CLPConfig = CLPConfig(),
  ): CLPResult = {
    val cache = new PivotCache
    val edges = graph.edges.toSeq.sortBy(e => (e.parent, e.child))
    // Every edge check is independent (per-edge seeded RNG) and each probe is
    // a tiny one-task Spark job — run them concurrently for wall-clock speed.
    val results = repro.util.Par.map(edges, cfg.parallelism) { e =>
      e -> checkEdge(e, dfs(e.parent), dfs(e.child), schemas(e.parent), schemas(e.child), cfg, cache)
    }
    var probes = 0L
    var sampled = 0L
    val pruned = Set.newBuilder[Edge]
    var g = graph
    for ((e, (doPrune, p, n)) <- results) {
      probes += p
      sampled += n
      if (doPrune) { pruned += e; g = g.removeEdge(e) }
    }
    CLPResult(g, pruned.result(), probes, sampled)
  }

  /** Probe a single edge; returns (prune?, probes run, rows sampled). */
  def checkEdge(
      e: Edge,
      parentDf: DataFrame,
      childDf: DataFrame,
      parentSchema: SchemaSet,
      childSchema: SchemaSet,
      cfg: CLPConfig,
      cache: PivotCache = new PivotCache,
  ): (Boolean, Long, Long) = {
    val common = childSchema.tokens.intersect(parentSchema.tokens).toSeq.sorted
    if (common.isEmpty) return (false, 0L, 0L)

    val rng = new scala.util.Random(cfg.seed ^ (e.parent + "→" + e.child).hashCode.toLong)
    val searchCols = rng.shuffle(common).take(math.max(1, cfg.s))
    val commonCols: Seq[Column] = common.map(qcol)

    var probes = 0L
    var sampled = 0L
    for (c <- searchCols) {
      // Draw a pivot value from the leading child rows — cheap: no full scan,
      // and memoized per (dataset, column) across all of this run's edges.
      val candidates = cache.candidates(e.child, c) {
        childDf
          .select(qcol(c))
          .where(qcol(c).isNotNull)
          .limit(cfg.pivotCandidates)
          .collect()
          .map(_.get(0))
      }
      if (candidates.nonEmpty) {
        val pivot = candidates(rng.nextInt(candidates.length))
        val filter = qcol(c) === lit(pivot)
        val sample = childDf.where(filter).select(commonCols: _*).limit(cfg.t).alias("l")
        val parentSide =
          (if (cfg.parentFiltered) parentDf.where(filter) else parentDf)
            .select(commonCols: _*)
            .alias("r")
        val cond = common.map(t => col(s"l.`$t`") <=> col(s"r.`$t`")).reduce(_ && _)
        // Tables here are small in absolute terms; hint the probe join so the
        // globally-disabled auto-broadcast does not force a full shuffle.
        val missing = sample.join(parentSide.hint("broadcast"), cond, "left_anti")
        probes += 1
        sampled += math.min(cfg.t, candidates.length).toLong
        if (!missing.isEmpty) return (true, probes, sampled)
      }
    }
    (false, probes, sampled)
  }
}
