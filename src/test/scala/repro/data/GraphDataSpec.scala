package repro.data

import org.apache.spark.sql.functions._

import repro.SparkSpec

class GraphDataSpec extends SparkSpec {

  test("generation is deterministic in the spec") {
    val a = GraphData.graph(spark, GraphData.wb).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val b = GraphData.graph(spark, GraphData.wb).collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(a == b)
  }

  test("graphs are symmetric") {
    val g = GraphData.graph(spark, 2000, 500, 0.9, 99).cache()
    val fwd = g.select("src", "dst")
    val rev = g.select(col("dst") as "src", col("src") as "dst")
    assert(fwd.except(rev).count() == 0)
  }

  test("graphs have no self-loops and no duplicates") {
    val g = GraphData.graph(spark, 3000, 800, 0.9, 98).cache()
    assert(g.where(col("src") === col("dst")).count() == 0)
    assert(g.count() == g.distinct().count())
  }

  test("vertex ids stay in the configured domain") {
    val g = GraphData.graph(spark, 2000, 300, 0.9, 97)
    val row = g.agg(min("src"), max("src"), min("dst"), max("dst")).head()
    assert(row.getLong(0) >= 1 && row.getLong(1) <= 300)
    assert(row.getLong(2) >= 1 && row.getLong(3) <= 300)
  }

  test("degree distribution is heavy-tailed (hubs exist)") {
    val g = GraphData.graph(spark, 20000, 5000, 0.85, 96).cache()
    val degrees = g.groupBy("src").count().select("count")
      .collect().map(_.getLong(0)).sorted.reverse
    val n = degrees.length
    // The top vertex should dominate the median by a wide margin.
    assert(degrees.head >= 10 * degrees(n / 2),
      s"max degree ${degrees.head} vs median ${degrees(n / 2)}")
  }

  test("the six dataset specs keep the paper's relative size order") {
    val counts = GraphData.all.map(s => GraphData.graph(spark, s).count())
    assert(counts == counts.sorted, s"sizes not increasing: $counts")
  }

  test("dataset registry exposes all six names") {
    assert(GraphData.byName.keySet == Set("WB", "AS", "WT", "LJ", "EN", "OK"))
  }

  test("sizeMb mirrors two 8-byte columns") {
    assert(GraphData.sizeMb(1000000) == 16.0)
  }
}
