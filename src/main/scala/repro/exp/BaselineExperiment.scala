package repro.exp

import repro.baselines.{Bharadwaj, KMeansSchema}

/** Table 4: schema-containment baselines ([3], KMeans) versus SGB, evaluated
  * against the ground-truth schema graph — correctly identified and missed
  * edge counts.
  */
object BaselineExperiment {

  final case class Row(method: String, correct: Int, notDetected: Int)
  final case class Result(name: String, bharadwaj: Row, kmeans: Row, sgb: Row)

  def run(name: String, out: PipelineOutput): Result = {
    val schemas = out.lake.schemas
    val gt = out.gtSchema
    val bh = Bharadwaj.run(schemas, gt)
    // Match SGB's granularity: one KMeans cluster per SGB cluster.
    val km = KMeansSchema.run(schemas, gt, k = math.max(2, out.sgb.clusters.size))
    val sgbFound = gt.edges.count(out.sgb.graph.edges.contains)
    Result(
      name,
      Row("[3]", bh.correctlyIdentified, bh.notDetected),
      Row("KMeans", km.correctlyIdentified, km.notDetected),
      Row("SGB", sgbFound, gt.edges.size - sgbFound),
    )
  }

  def render(results: Seq[Result]): String = {
    val rows = results.flatMap { r =>
      val p = PaperNumbers.table4.get(r.name)
      def pp(f: PaperNumbers.BaselineCounts => (Int, Int)): String =
        p.map { x => val (c, m) = f(x); s"$c / $m" }.getOrElse("-")
      Seq(
        Seq(r.name, "[3]", s"${r.bharadwaj.correct} / ${r.bharadwaj.notDetected}", pp(_.bharadwaj)),
        Seq(r.name, "KMeans", s"${r.kmeans.correct} / ${r.kmeans.notDetected}", pp(_.kmeans)),
        Seq(r.name, "SGB", s"${r.sgb.correct} / ${r.sgb.notDetected}", pp(_.sgb)),
      )
    }
    TextTable.section(
      "Table 4 — schema containment baselines (correct / not detected)",
      TextTable.format(Seq("Data", "Method", "ours", "paper"), rows),
    )
  }
}
