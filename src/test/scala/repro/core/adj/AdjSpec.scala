package repro.core.adj

import repro.{Oracle, SparkSpec}
import repro.baselines.SparkSqlJoin
import repro.core.{SparkTestData, TestHelpers}
import repro.core.hypergraph.QueryLibrary

class AdjSpec extends SparkSpec {

  private val smallCfg = Adj.Config(samples = 60, cubeBudget = Some(8))

  test("co-optimized ADJ matches the oracle on every reported query") {
    val g = TestHelpers.randomGraph(nodes = 16, edges = 40, seed = 31)
    val gdf = SparkTestData.graphDf(spark, g)
    for ((name, q) <- QueryLibrary.reported) {
      val (df, report) = Adj.runOnGraph(spark, q, gdf, smallCfg)
      Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"), "e" -> gdf)
      assert(report.totalSec > 0, s"$name: $report")
    }
  }

  test("communication-first ADJ (HCubeJ) matches the oracle on every reported query") {
    val g = TestHelpers.randomGraph(nodes = 16, edges = 40, seed = 32)
    val gdf = SparkTestData.graphDf(spark, g)
    for ((name, q) <- QueryLibrary.reported) {
      val (df, report) = Adj.runOnGraph(spark, q, gdf,
        smallCfg.copy(strategy = Adj.CommunicationFirst))
      Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"), "e" -> gdf)
      assert(report.preComputingSec == 0.0, s"$name pre-computed under HCubeJ: $report")
      assert(report.plan.preCompute.isEmpty)
    }
  }

  test("HCubeJ+Cache variant matches the oracle") {
    val g = TestHelpers.randomGraph(nodes = 14, edges = 36, seed = 33)
    val gdf = SparkTestData.graphDf(spark, g)
    for (q <- Seq(QueryLibrary.q2, QueryLibrary.q4)) {
      val (df, _) = Adj.runOnGraph(spark, q, gdf,
        smallCfg.copy(strategy = Adj.CommunicationFirst, cacheSize = 100000))
      Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"), "e" -> gdf)
    }
  }

  test("both strategies agree on the easy queries Q7-Q11") {
    val g = TestHelpers.randomGraph(nodes = 10, edges = 18, seed = 34)
    val gdf = SparkTestData.graphDf(spark, g)
    for ((name, q) <- QueryLibrary.all if name.drop(1).toInt >= 7) {
      val (a, _) = Adj.runOnGraph(spark, q, gdf, smallCfg)
      val (b, _) = Adj.runOnGraph(spark, q, gdf, smallCfg.copy(strategy = Adj.CommunicationFirst))
      assert(a.collect().map(_.toSeq).toSet == b.collect().map(_.toSeq).toSet, name)
    }
  }

  test("skewed graphs are handled correctly end to end") {
    val g = TestHelpers.skewedGraph(nodes = 40, edges = 120, seed = 35)
    val gdf = SparkTestData.graphDf(spark, g)
    for (q <- Seq(QueryLibrary.q1, QueryLibrary.q5)) {
      val (df, _) = Adj.runOnGraph(spark, q, gdf, smallCfg)
      Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"), "e" -> gdf)
    }
  }

  test("the report accounts for all pipeline stages") {
    val g = TestHelpers.randomGraph(nodes = 14, edges = 30, seed = 36)
    val gdf = SparkTestData.graphDf(spark, g)
    val (_, report) = Adj.runOnGraph(spark, QueryLibrary.q4, gdf, smallCfg)
    assert(report.optimizationSec > 0)
    assert(report.communicationSec > 0)
    assert(report.computationSec > 0)
    assert(report.preComputingSec >= 0)
    assert(math.abs(report.totalSec - (report.optimizationSec + report.preComputingSec +
      report.communicationSec + report.computationSec)) < 1e-9)
    assert(report.shuffledTuples > 0)
  }

  test("the plan's attribute order covers every attribute exactly once") {
    val g = TestHelpers.randomGraph(nodes = 12, edges = 26, seed = 37)
    val gdf = SparkTestData.graphDf(spark, g)
    for (q <- Seq(QueryLibrary.q2, QueryLibrary.q4, QueryLibrary.q6)) {
      val (_, report) = Adj.runOnGraph(spark, q, gdf, smallCfg)
      assert(report.plan.ord.sorted.toSeq == (0 until q.numAttrs))
    }
  }

  test("empty graph produces empty results without failure") {
    val gdf = SparkTestData.graphDf(spark, Seq.empty)
    val (df, _) = Adj.runOnGraph(spark, QueryLibrary.q1, gdf, smallCfg)
    assert(df.count() == 0)
  }

  test("run rejects mismatched data arity") {
    val rdd = spark.sparkContext.parallelize(Seq(Array(1L, 2L)))
    intercept[IllegalArgumentException] {
      Adj.run(spark, QueryLibrary.q1, Vector(rdd), smallCfg)
    }
  }
}
