package repro.exp

/** The numbers reported in the paper's evaluation tables, kept next to our
  * measurements so benches and EXPERIMENTS.md can print paper-vs-ours rows.
  */
object PaperNumbers {

  /** Tables 1 & 2: (correct, incorrect) after each stage, notDetected = 0. */
  final case class EdgeCounts(correct: Int, sgbIncorrect: Int, mmpIncorrect: Int, clpIncorrect: Int)

  val table1: Map[String, EdgeCounts] = Map(
    "customer1" -> EdgeCounts(278, 6657, 3414, 110),
    "customer2" -> EdgeCounts(31, 1192, 600, 315),
    "customer3" -> EdgeCounts(21, 1769, 421, 272),
  )

  val table2: Map[String, EdgeCounts] = Map(
    "tableUnion" -> EdgeCounts(1863, 2902, 707, 115),
    "kaggle"     -> EdgeCounts(1093, 1663, 476, 58),
  )

  /** Table 3: pairwise row-level operations (per dataset, per method). */
  final case class OpCounts(gtSchema: Double, sgb: Double, gtContent: Double, mmp: Double, clp: Double)

  val table3: Map[String, OpCounts] = Map(
    "customer2"  -> OpCounts(1.34e9, 2.13e5, 7.36e21, 1192, 1.06e10),
    "customer1"  -> OpCounts(1.47e5, 1.32e5, 7.4e21, 6657, 2.5e12),
    "kaggle"     -> OpCounts(9e3, 2.05e4, 5.55e15, 5512, 3.39e10),
    "tableUnion" -> OpCounts(4.33e4, 9.1e4, 9.77e11, 9530, 4.94e8),
  )

  /** Table 4: schema-containment baselines (correctly identified, missed). */
  final case class BaselineCounts(bharadwaj: (Int, Int), kmeans: (Int, Int), sgb: (Int, Int))

  val table4: Map[String, BaselineCounts] = Map(
    "customer1" -> BaselineCounts((10774, 363), (8781, 2356), (11137, 0)),
    "customer2" -> BaselineCounts((2009, 61), (1455, 615), (2070, 0)),
  )

  /** Table 5: wall-clock seconds per stage (paper's clusters, their scale). */
  final case class StageTimes(gt: String, sgb: String, mmp: String, clp: String, total: String)

  val table5: Map[String, StageTimes] = Map(
    "customer1"  -> StageTimes("~days", "0.51 s", "7.07 min", "5.12 h", "~5.24 h"),
    "customer2"  -> StageTimes("~days", "0.8 s", "8.25 min", "4.75 h", "~4.89 h"),
    "tableUnion" -> StageTimes("3.37 h", "0.03 s", "9 s", "5.4 min", "5.5 min"),
    "kaggle"     -> StageTimes("~days", "0.0114 s", "3.45 min", "5.15 h", "5.37 h"),
  )

  /** Table 6: incorrect edges remaining, by (s, t), 42 TB enterprise data. */
  val table6: Map[(Int, Int), Int] = Map(
    (1, 5) -> 908, (1, 10) -> 824, (1, 30) -> 712,
    (4, 5) -> 141, (4, 10) -> 122, (4, 30) -> 110,
    (8, 5) -> 135, (8, 10) -> 121, (8, 30) -> 109,
  )

  /** Table 7: (deleted nodes, deleted edges, retained nodes, retention edges,
    * GDPR row-scan savings per month).
    */
  final case class OptCounts(delNodes: Int, delEdges: Int, retNodes: Int, retEdges: Int, gdprSavings: Double)

  val table7: Map[String, OptCounts] = Map(
    "customer1" -> OptCounts(19, 259, 99, 19, 5.3e6),
    "customer2" -> OptCounts(12, 19, 18, 12, 0.2e6),
  )
}
