package repro.baselines

import repro.{Oracle, SparkSpec}
import repro.core.{SparkTestData, TestHelpers}
import repro.core.hypergraph.QueryLibrary

class SparkSqlJoinSpec extends SparkSpec {

  test("generated SQL for the triangle query references all atoms and predicates") {
    val s = SparkSqlJoin.sql(QueryLibrary.q1, "e")
    assert(s.contains("FROM e e0, e e1, e e2"))
    assert(s.contains("WHERE"))
    assert(s.toLowerCase.contains("as a") && s.toLowerCase.contains("as c"))
  }

  test("generated SQL joins each attribute's occurrences") {
    val q = QueryLibrary.q1
    val s = SparkSqlJoin.sql(q, "e")
    // Triangle: a in e0.src/e2.src, b in e0.dst/e1.src, c in e1.dst/e2.dst —
    // two equality predicates beyond the three projections... one per extra
    // occurrence: 6 occurrences, 3 classes → 3 predicates.
    assert(s.split("=").length - 1 >= 3)
  }

  test("SparkSQL baseline matches the DuckDB oracle on the reported queries") {
    val g = TestHelpers.randomGraph(nodes = 14, edges = 32, seed = 71)
    val gdf = SparkTestData.graphDf(spark, g)
    for ((name, q) <- QueryLibrary.reported) {
      val df = SparkSqlJoin.run(spark, q, gdf)
      Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"), "e" -> gdf)
    }
  }

  test("SparkSQL baseline agrees with the naive evaluator") {
    val g = TestHelpers.randomGraph(nodes = 10, edges = 20, seed = 72)
    val gdf = SparkTestData.graphDf(spark, g)
    val q = QueryLibrary.q2
    val got = SparkSqlJoin.run(spark, q, gdf).collect()
      .map(r => (0 until q.numAttrs).map(r.getLong).toVector).toSet
    assert(got == TestHelpers.naiveJoin(q, TestHelpers.bindGraph(q, g)))
  }

  test("acyclic queries run through the baseline too") {
    val g = TestHelpers.randomGraph(nodes = 10, edges = 16, seed = 73)
    val gdf = SparkTestData.graphDf(spark, g)
    for (q <- Seq(QueryLibrary.q7, QueryLibrary.q9)) {
      val df = SparkSqlJoin.run(spark, q, gdf)
      Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"), "e" -> gdf)
    }
  }
}
