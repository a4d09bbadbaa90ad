package repro.core

import org.apache.spark.sql.functions._

import repro.{SparkSpec, SynthData}

/** The user-facing facade: hand it named DataFrames, get a containment graph. */
class R2D2Spec extends SparkSpec {

  lazy val run: R2D2Run = {
    val li = SynthData.lineitem(spark, sf = 0.0002, seed = 61).cache()
    R2D2.run(Seq(
      "li" -> li,
      "north" -> li.where(col("l_returnflag") === "N").cache(),
      "cheap" -> li.where(col("l_extendedprice") <= 30000).cache(),
      "slim" -> li.drop("l_tax", "l_discount").cache(),
      "fake" -> li.withColumn("l_quantity",
        when(rand(3) < 0.4, col("l_quantity") / 2 + 1).otherwise(col("l_quantity"))).cache(),
    ))
  }

  test("facade detects the three true containments") {
    val g = run.containmentGraph
    assert(g.edges.contains(Edge("li", "north")))
    assert(g.edges.contains(Edge("li", "cheap")))
    assert(g.edges.contains(Edge("li", "slim")))
  }

  test("facade rejects the in-range impostor") {
    assert(!run.containmentGraph.edges.contains(Edge("li", "fake")))
  }

  test("schema sets are exposed for every dataset") {
    assert(run.schemas.keySet == Set("li", "north", "cheap", "slim", "fake"))
    assert(run.schemas("slim").size == run.schemas("li").size - 2)
  }

  test("stats catalog is populated for every dataset") {
    Seq("li", "north", "cheap", "slim", "fake").foreach(n => assert(run.catalog.get(n).isDefined))
  }

  test("stage results expose pruned edges and counters") {
    assert(run.sgb.graph.edgeCount >= run.mmp.graph.edgeCount)
    assert(run.mmp.graph.edgeCount >= run.clp.graph.edgeCount)
    assert(run.mmp.opCount == run.sgb.graph.edgeCount)
  }

  test("nested input frames are flattened before the pipeline") {
    val nested = spark.range(20).select(struct(col("id").as("k")).as("s"), (col("id") * 2).as("v"))
    val r = R2D2.run(Seq("n" -> nested, "m" -> nested.limit(10)))
    assert(r.schemas("n").tokens == Set("s.k", "v"))
    assert(r.containmentGraph.edges.contains(Edge("n", "m")))
  }
}
