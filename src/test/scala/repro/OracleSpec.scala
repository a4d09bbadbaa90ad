package repro

import org.apache.spark.sql.functions._

/** Sanity of the DuckDB oracle itself, plus oracle-backed checks of the
  * containment queries the pipeline's semantics rest on.
  */
class OracleSpec extends SparkSpec {

  lazy val li = SynthData.lineitem(spark, sf = 0.0002, seed = 41).cache()

  test("oracle accepts a matching aggregate") {
    Oracle.assertEquivalent(
      li.groupBy("l_returnflag").agg(count(lit(1)).as("n")),
      "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li,
    )
  }

  test("oracle rejects a wrong result") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        li.groupBy("l_returnflag").agg((count(lit(1)) + 1).as("n")),
        "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li,
      )
    }
  }

  test("oracle rejects mismatched column sets") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        li.agg(count(lit(1)).as("wrong_name")),
        "SELECT count(*) AS n FROM lineitem",
        "lineitem" -> li,
      )
    }
  }

  test("left-anti containment check agrees with DuckDB EXCEPT semantics") {
    val child = li.where(col("l_returnflag") === "N")
    val cols = li.columns.map(col)
    val missing = child.alias("l").join(
      li.alias("r").hint("broadcast"),
      li.columns.map(c => col(s"l.`$c`") <=> col(s"r.`$c`")).reduce(_ && _),
      "left_anti",
    )
    Oracle.assertEquivalent(
      missing.agg(count(lit(1)).as("n")),
      """SELECT count(*) AS n FROM
        |(SELECT * FROM child EXCEPT SELECT * FROM parent) q""".stripMargin,
      "child" -> child, "parent" -> li,
    )
    assert(missing.isEmpty)
  }

  test("containment fraction agrees with a DuckDB INTERSECT count") {
    import repro.core.{GroundTruth, TableData}
    val child = li.limit(100).union(li.limit(50).withColumn("l_quantity", lit(-1.0))).cache()
    val childDistinct = child.distinct().count().toDouble
    val conn = java.sql.DriverManager.getConnection("jdbc:duckdb:")
    // Compute |distinct(child) ∩ distinct(parent)| / |distinct(child)| in DuckDB.
    val frac = GroundTruth.containmentFraction(
      TableData.fromDf("c", child), TableData.fromDf("p", li))
    val inter = {
      val reg = (name: String, df: org.apache.spark.sql.DataFrame) => {
        val colsDef = df.columns.map(c => s"$c VARCHAR").mkString(", ")
        conn.createStatement.execute(s"CREATE TABLE $name ($colsDef)")
        val ps = conn.prepareStatement(s"INSERT INTO $name VALUES (${df.columns.map(_ => "?").mkString(",")})")
        df.collect().foreach { r =>
          df.columns.indices.foreach(i => ps.setString(i + 1, Option(r.get(i)).map(_.toString).orNull))
          ps.addBatch()
        }
        ps.executeBatch(); ps.close()
      }
      reg("c", child); reg("p", li)
      val rs = conn.createStatement.executeQuery(
        "SELECT count(*) FROM (SELECT DISTINCT * FROM c INTERSECT SELECT DISTINCT * FROM p) q")
      rs.next(); val v = rs.getLong(1); conn.close(); v
    }
    assert(math.abs(frac - inter / childDistinct) < 1e-9, s"frac=$frac duck=${inter / childDistinct}")
  }
}
