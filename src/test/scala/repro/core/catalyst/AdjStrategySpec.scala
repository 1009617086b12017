package repro.core.catalyst

import org.apache.spark.sql.SparkSession

import repro.{Oracle, SparkSpec}
import repro.baselines.SparkSqlJoin
import repro.core.{SparkTestData, TestHelpers}
import repro.core.hypergraph.QueryLibrary

class AdjStrategySpec extends SparkSpec {

  /** A session clone with the ADJ strategy installed. */
  private lazy val adjSession: SparkSession = {
    val s = spark.newSession()
    s.conf.set("spark.sql.autoBroadcastJoinThreshold", -1)
    s.conf.set("spark.repro.adj.samples", "40")
    s.experimental.extraStrategies = Seq(AdjStrategy(s))
    s
  }

  private def planString(df: org.apache.spark.sql.DataFrame): String =
    df.queryExecution.executedPlan.toString

  test("a 3-way equi-join is planned as AdjJoin") {
    val g = TestHelpers.randomGraph(nodes = 14, edges = 30, seed = 61)
    SparkTestData.graphDf(adjSession, g).createOrReplaceTempView("edges_cat")
    val df = adjSession.sql(SparkSqlJoin.sql(QueryLibrary.q1, "edges_cat"))
    assert(planString(df).contains("AdjJoin"), planString(df))
  }

  test("the ADJ-planned triangle query returns oracle-correct results") {
    val g = TestHelpers.randomGraph(nodes = 16, edges = 40, seed = 62)
    val gdf = SparkTestData.graphDf(adjSession, g)
    gdf.createOrReplaceTempView("edges_cat2")
    val df = adjSession.sql(SparkSqlJoin.sql(QueryLibrary.q1, "edges_cat2"))
    Oracle.assertEquivalent(df, SparkSqlJoin.sql(QueryLibrary.q1, "e"), "e" -> gdf)
  }

  test("the ADJ-planned Q4 query returns oracle-correct results") {
    val g = TestHelpers.randomGraph(nodes = 14, edges = 32, seed = 63)
    val gdf = SparkTestData.graphDf(adjSession, g)
    gdf.createOrReplaceTempView("edges_cat3")
    val df = adjSession.sql(SparkSqlJoin.sql(QueryLibrary.q4, "edges_cat3"))
    assert(planString(df).contains("AdjJoin"), planString(df))
    Oracle.assertEquivalent(df, SparkSqlJoin.sql(QueryLibrary.q4, "e"), "e" -> gdf)
  }

  test("binary joins are left to the default planner") {
    val g = TestHelpers.randomGraph(nodes = 12, edges = 24, seed = 64)
    SparkTestData.graphDf(adjSession, g).createOrReplaceTempView("edges_cat4")
    val df = adjSession.sql(
      "SELECT a.src, a.dst, b.dst AS d2 FROM edges_cat4 a JOIN edges_cat4 b ON a.dst = b.src")
    assert(!planString(df).contains("AdjJoin"))
  }

  test("the strategy can be disabled by configuration") {
    val g = TestHelpers.randomGraph(nodes = 12, edges = 24, seed = 65)
    SparkTestData.graphDf(adjSession, g).createOrReplaceTempView("edges_cat5")
    adjSession.conf.set("spark.repro.adj.enabled", "false")
    try {
      val df = adjSession.sql(SparkSqlJoin.sql(QueryLibrary.q1, "edges_cat5"))
      assert(!planString(df).contains("AdjJoin"))
    } finally adjSession.conf.set("spark.repro.adj.enabled", "true")
  }

  test("non-Long columns fall back to the default planner") {
    val g = TestHelpers.randomGraph(nodes = 10, edges = 20, seed = 66)
    val gdf = SparkTestData.graphDf(adjSession, g)
      .selectExpr("CAST(src AS INT) AS src", "CAST(dst AS INT) AS dst")
    gdf.createOrReplaceTempView("edges_cat6")
    val df = adjSession.sql(SparkSqlJoin.sql(QueryLibrary.q1, "edges_cat6"))
    assert(!planString(df).contains("AdjJoin"))
  }

  test("communication-first strategy config is honored") {
    val g = TestHelpers.randomGraph(nodes = 12, edges = 26, seed = 67)
    val gdf = SparkTestData.graphDf(adjSession, g)
    gdf.createOrReplaceTempView("edges_cat7")
    adjSession.conf.set("spark.repro.adj.strategy", "communication-first")
    try {
      val df = adjSession.sql(SparkSqlJoin.sql(QueryLibrary.q1, "edges_cat7"))
      Oracle.assertEquivalent(df, SparkSqlJoin.sql(QueryLibrary.q1, "e"), "e" -> gdf)
    } finally adjSession.conf.set("spark.repro.adj.strategy", "co-optimization")
  }
}
