package repro.stats

import java.nio.file.Files

import org.apache.spark.sql.functions._

import repro.{SparkSpec, SynthData}

/** The parquet-footer substrate: MMP's min/max must be readable from real
  * parquet metadata without scanning data, and must agree with the
  * aggregation-computed catalog.
  */
class ParquetStatsSpec extends SparkSpec {

  private def writeTmp(df: org.apache.spark.sql.DataFrame, parts: Int = 1): String = {
    val dir = Files.createTempDirectory("pqstats").toFile
    dir.deleteOnExit()
    val path = s"${dir.getAbsolutePath}/t"
    df.repartition(parts).write.mode("overwrite").parquet(path)
    path
  }

  lazy val li = SynthData.lineitem(spark, sf = 0.001, seed = 9).cache()

  test("footer stats equal computed stats for numeric, string and date columns") {
    val path = writeTmp(li)
    val footer = ParquetStats.read(path)
    val computed = StatsCatalog.compute(li)
    assert(footer.rowCount == computed.rowCount)
    for ((colName, expected) <- computed.cols) {
      val got = footer.cols.get(colName)
      assert(got.contains(expected), s"$colName: footer=$got computed=$expected")
    }
  }

  test("multi-file datasets merge min/max across part files") {
    val path = writeTmp(li, parts = 4)
    val footer = ParquetStats.read(path)
    val computed = StatsCatalog.compute(li)
    assert(footer.rowCount == computed.rowCount)
    assert(footer.cols("l_quantity") == computed.cols("l_quantity"))
    assert(footer.cols("l_returnflag") == computed.cols("l_returnflag"))
  }

  test("integer and long columns decode from INT32/INT64 footers") {
    val df = spark.range(1, 101).select(
      col("id"),
      (col("id") % 7).cast("int").as("small"),
    )
    val footer = ParquetStats.read(writeTmp(df))
    assert(footer.cols("id") == NumStats(1, 100))
    assert(footer.cols("small") == NumStats(0, 6))
  }

  test("boolean columns decode to 0/1 range") {
    val df = spark.range(10).select((col("id") % 2 === 0).as("flag"))
    val footer = ParquetStats.read(writeTmp(df))
    assert(footer.cols("flag") == NumStats(0.0, 1.0))
  }

  test("float columns decode from FLOAT footers") {
    val df = spark.range(1, 11).select((col("id").cast("float") / 2.0f).as("f"))
    val footer = ParquetStats.read(writeTmp(df))
    assert(footer.cols("f") == NumStats(0.5, 5.0))
  }

  test("timestamp columns canonicalize to epoch millis, matching the catalog") {
    // INT96 footers carry no statistics; write as annotated INT64 micros.
    spark.conf.set("spark.sql.parquet.outputTimestampType", "TIMESTAMP_MICROS")
    val df = spark.sql(
      "SELECT timestamp'2020-01-01 00:00:00 UTC' AS ts UNION ALL SELECT timestamp'2021-06-15 12:00:00 UTC'")
    val footer = ParquetStats.read(writeTmp(df))
    val computed = StatsCatalog.compute(df)
    assert(footer.cols("ts") == computed.cols("ts"))
  }

  test("sizeBytes reflects on-disk bytes") {
    val footer = ParquetStats.read(writeTmp(li))
    assert(footer.sizeBytes > 0)
  }

  test("reading a directory with no parquet files fails loudly") {
    val dir = Files.createTempDirectory("pqempty").toFile
    dir.deleteOnExit()
    intercept[IllegalArgumentException](ParquetStats.read(dir.getAbsolutePath))
  }

  test("MMP works identically from footer stats and from the catalog") {
    import repro.core._
    val parent = li
    val child = li.where(col("l_quantity") > 25)
    val pPath = writeTmp(parent)
    val cPath = writeTmp(child)
    val footers = Map("p" -> ParquetStats.read(pPath), "c" -> ParquetStats.read(cPath))
    val computed = Map("p" -> StatsCatalog.compute(parent), "c" -> StatsCatalog.compute(child))
    val g = ContainmentGraph(Seq("p", "c"), Seq(Edge("p", "c"), Edge("c", "p")))
    val fromFooter = MMP.prune(g, footers(_)).graph.edges
    val fromCatalog = MMP.prune(g, computed(_)).graph.edges
    assert(fromFooter == fromCatalog)
    assert(fromFooter.contains(Edge("p", "c")))  // child ⊆ parent survives
    assert(!fromFooter.contains(Edge("c", "p"))) // parent ⊄ child pruned by range
  }
}
