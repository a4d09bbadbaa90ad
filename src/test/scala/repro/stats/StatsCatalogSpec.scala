package repro.stats

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec, SynthData}

class StatsCatalogSpec extends SparkSpec {

  lazy val li = SynthData.lineitem(spark, sf = 0.001, seed = 3).cache()

  test("computed min/max agree with the DuckDB oracle on numeric columns") {
    val agg = li.agg(
      min("l_quantity").as("min_q"), max("l_quantity").as("max_q"),
      min("l_extendedprice").as("min_p"), max("l_extendedprice").as("max_p"),
    )
    Oracle.assertEquivalent(
      agg,
      """SELECT min(CAST(l_quantity AS DOUBLE)) AS min_q, max(CAST(l_quantity AS DOUBLE)) AS max_q,
        |       min(CAST(l_extendedprice AS DOUBLE)) AS min_p, max(CAST(l_extendedprice AS DOUBLE)) AS max_p
        |FROM lineitem""".stripMargin,
      "lineitem" -> li,
    )
    val s = StatsCatalog.compute(li)
    val row = agg.collect()(0)
    assert(s.cols("l_quantity") == NumStats(row.getDouble(0), row.getDouble(1)))
    assert(s.cols("l_extendedprice") == NumStats(row.getDouble(2), row.getDouble(3)))
  }

  test("row count matches the DuckDB oracle") {
    val cnt = li.agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(cnt, "SELECT count(*) AS n FROM lineitem", "lineitem" -> li)
    assert(StatsCatalog.compute(li).rowCount == li.count())
  }

  test("string columns get lexicographic StrStats") {
    val s = StatsCatalog.compute(li)
    val flags = li.select("l_returnflag").distinct().collect().map(_.getString(0)).sorted
    assert(s.cols("l_returnflag") == StrStats(flags.head, flags.last))
  }

  test("date columns canonicalize to epoch days") {
    val s = StatsCatalog.compute(li)
    val r = li.agg(min("l_shipdate"), max("l_shipdate")).collect()(0)
    val expected = NumStats(
      r.getDate(0).toLocalDate.toEpochDay.toDouble,
      r.getDate(1).toLocalDate.toEpochDay.toDouble,
    )
    assert(s.cols("l_shipdate") == expected)
  }

  test("nested schemas flatten to dotted tokens with correct stats") {
    val nested = spark.range(1, 11).select(
      struct(col("id").as("key"), (col("id") * 2).as("twice")).as("pair"),
      lit("z").as("tag"),
    )
    val s = StatsCatalog.compute(nested)
    assert(s.cols.keySet == Set("pair.key", "pair.twice", "tag"))
    assert(s.cols("pair.key") == NumStats(1, 10))
    assert(s.cols("pair.twice") == NumStats(2, 20))
  }

  test("flatten produces a flat DataFrame with token column names") {
    val nested = spark.range(3).select(struct(col("id").as("k")).as("s"), col("id"))
    val flat = StatsCatalog.flatten(nested)
    assert(flat.columns.toSeq == Seq("s.k", "id"))
    assert(flat.schema.fields.forall(!_.dataType.typeName.contains("struct")))
  }

  test("empty DataFrame yields zero rows and no column stats") {
    val empty = li.where(lit(false))
    val s = StatsCatalog.compute(empty)
    assert(s.rowCount == 0)
    assert(s.cols.isEmpty)
  }

  test("all-null column yields no stats for that column") {
    val df = spark.range(5).select(col("id"), lit(null).cast("double").as("hole"))
    val s = StatsCatalog.compute(df)
    assert(!s.cols.contains("hole"))
    assert(s.cols.contains("id"))
  }

  test("catalog ingestion caches and serves by name") {
    val cat = new StatsCatalog
    val s = cat.ingest("li", li)
    assert(cat("li") == s)
    assert(cat.get("nope").isEmpty)
    intercept[NoSuchElementException](cat("nope"))
    cat.remove("li")
    assert(cat.get("li").isEmpty)
  }

  test("sizeBytes scales with row count") {
    val small = StatsCatalog.compute(li.limit(10))
    val big = StatsCatalog.compute(li)
    assert(big.sizeBytes > small.sizeBytes)
    assert(small.sizeBytes > 0)
  }
}
