package repro.exp

import repro.lake.{FamilySpec, LakeProfile}

/** Lake profiles standing in for the paper's evaluation corpora (§6.1).
  *
  * Scales are laptop-sized but the *shapes* mirror the paper: customer 1 has
  * few schema families with many same-schema tables (densest schema graph of
  * the three enterprise orgs); customer 2 is the largest-by-rows org with the
  * sparsest graph; customer 3 sits between; `tableUnion` is many tiny tables
  * (~300, as in the Table Union corpus); `kaggle` is ~140 larger tables.
  * The `scale` parameter multiplies root row counts only, so graph shape is
  * invariant while data volume grows (used by the scalability sweep).
  */
object Profiles {

  private val Roots = Vector("lineitem", "orders", "customer", "part", "orders_nested")

  private def families(
      n: Int,
      rows: Long,
      spec: (String, String, Long) => FamilySpec,
  ): Seq[FamilySpec] =
    (0 until n).map { i =>
      val root = Roots(i % Roots.size)
      spec(root, s"f${i}_", rows)
    }

  /** Tiny lake for unit tests: 2 families, ~15 datasets, ~100-row roots. */
  def tiny(seed: Long = 7): LakeProfile = LakeProfile(
    "tiny",
    seed,
    Seq(
      FamilySpec("lineitem", "t0_", 150, filters = 2, projections = 1, addRows = 1,
        addCols = 1, noiseIn = 1, noiseOut = 1, duplicates = 1, chainLen = 2),
      FamilySpec("customer", "t1_", 100, filters = 1, projections = 1, noiseIn = 1),
    ),
    noiseRho = 0.12,
    addRowsFrac = 0.05,
  )

  /** Customer 1 — 0.68 TB in the paper; densest schema graph. */
  def customer1(scale: Double = 1.0, seed: Long = 101): LakeProfile = LakeProfile(
    "customer1",
    seed,
    families(4, (1500 * scale).toLong max 60, (root, pfx, rows) =>
      FamilySpec(root, pfx, rows, filters = 4, projections = 3, addRows = 2,
        addCols = 2, noiseIn = 3, noiseOut = 2, duplicates = 1, chainLen = 2)),
    noiseRho = 0.08,
    addRowsFrac = 0.015,
  )

  /** Customer 2 — 41.8 TB in the paper; biggest rows, sparsest graph. */
  def customer2(scale: Double = 1.0, seed: Long = 102): LakeProfile = LakeProfile(
    "customer2",
    seed,
    families(10, (8000 * scale).toLong max 60, (root, pfx, rows) =>
      FamilySpec(root, pfx, rows, filters = 2, projections = 1, addRows = 1,
        addCols = 1, noiseIn = 2, noiseOut = 1, chainLen = 1)),
    noiseRho = 0.06,
    addRowsFrac = 0.01,
  )

  /** Customer 3 — 27.6 TB in the paper. */
  def customer3(scale: Double = 1.0, seed: Long = 103): LakeProfile = LakeProfile(
    "customer3",
    seed,
    families(6, (4000 * scale).toLong max 60, (root, pfx, rows) =>
      FamilySpec(root, pfx, rows, filters = 3, projections = 2, addRows = 1,
        addCols = 1, noiseIn = 2, noiseOut = 2, duplicates = 1, chainLen = 1)),
    noiseRho = 0.06,
    addRowsFrac = 0.012,
  )

  /** Table Union Benchmark analog — ~300 small tables, 324 MB in the paper. */
  def tableUnion(scale: Double = 1.0, seed: Long = 104): LakeProfile = LakeProfile(
    "tableUnion",
    seed,
    families(30, (200 * scale).toLong max 40, (root, pfx, rows) =>
      FamilySpec(root, pfx, rows, filters = 3, projections = 2, addRows = 1,
        addCols = 1, noiseIn = 1, noiseOut = 1, chainLen = 0)),
    noiseRho = 0.10,
    addRowsFrac = 0.03,
  )

  /** Kaggle-roots analog — ~140 larger tables, 24 GB in the paper. */
  def kaggle(scale: Double = 1.0, seed: Long = 105): LakeProfile = LakeProfile(
    "kaggle",
    seed,
    families(14, (3000 * scale).toLong max 60, (root, pfx, rows) =>
      FamilySpec(root, pfx, rows, filters = 3, projections = 1, addRows = 1,
        addCols = 1, noiseIn = 1, noiseOut = 1, duplicates = 1, chainLen = 0)),
    noiseRho = 0.08,
    addRowsFrac = 0.02,
  )

  def byName(name: String, scale: Double = 1.0): LakeProfile = name match {
    case "tiny"       => tiny()
    case "customer1"  => customer1(scale)
    case "customer2"  => customer2(scale)
    case "customer3"  => customer3(scale)
    case "tableUnion" => tableUnion(scale)
    case "kaggle"     => kaggle(scale)
    case other        => throw new IllegalArgumentException(s"unknown profile $other")
  }
}
