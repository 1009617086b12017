package repro.core.exec

import repro.{Oracle, SparkSpec}
import repro.baselines.SparkSqlJoin
import repro.core.{SparkTestData, TestHelpers}
import repro.core.adj.Adj
import repro.core.hcube.Rel
import repro.core.hypergraph.QueryLibrary

class MultiwayJoinSpec extends SparkSpec {

  private def rels(q: repro.core.hypergraph.Hypergraph, g: Seq[Array[Long]]) = {
    val rdd = spark.sparkContext.parallelize(g, 4)
    q.atoms.indices.map { i =>
      Rel(q.atoms(i).name, q.atoms(i).attrs.map(q.attrId), rdd, g.length.toLong)
    }
  }

  test("one-round triangle join matches the DuckDB oracle") {
    val g = TestHelpers.randomGraph(nodes = 20, edges = 50, seed = 7)
    val q = QueryLibrary.q1
    val (rdd, timings) = MultiwayJoin.execute(
      spark, rels(q, g), ord = Array(0, 1, 2), p = Array(2, 2, 2))
    val df = Adj.toDf(spark, rdd, q.attributes)
    Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"),
      "e" -> SparkTestData.graphDf(spark, g))
    assert(timings.communicationSec >= 0 && timings.computationSec >= 0)
  }

  test("one-round join with non-trivial shares matches the oracle (Q2)") {
    val g = TestHelpers.randomGraph(nodes = 15, edges = 40, seed = 8)
    val q = QueryLibrary.q2
    val (rdd, _, p) = MultiwayJoin.executeOptimized(
      spark, rels(q, g), ord = Array(0, 1, 2, 3), numAttrs = 4, cubeBudget = 8)
    assert(p.product >= 8 && p.product <= 32)
    val df = Adj.toDf(spark, rdd, q.attributes)
    Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"),
      "e" -> SparkTestData.graphDf(spark, g))
  }

  test("one-round join matches the oracle under a permuted attribute order") {
    val g = TestHelpers.randomGraph(nodes = 14, edges = 35, seed = 9)
    val q = QueryLibrary.q4
    val (rdd, _) = MultiwayJoin.execute(
      spark, rels(q, g), ord = Array(4, 1, 0, 2, 3), p = Array(1, 2, 2, 1, 1))
    val df = Adj.toDf(spark, rdd, q.attributes)
    Oracle.assertEquivalent(df, SparkSqlJoin.sql(q, "e"),
      "e" -> SparkTestData.graphDf(spark, g))
  }

  test("cache-enabled execution returns the same rows") {
    val g = TestHelpers.randomGraph(nodes = 15, edges = 45, seed = 10)
    val q = QueryLibrary.q1
    val (plain, _)  = MultiwayJoin.execute(spark, rels(q, g), Array(0, 1, 2), Array(2, 2, 1))
    val (cached, _) = MultiwayJoin.execute(spark, rels(q, g), Array(0, 1, 2), Array(2, 2, 1),
      cacheSize = 100000)
    assert(plain.map(_.toVector).collect().toSet == cached.map(_.toVector).collect().toSet)
  }

  test("single-cube execution (p all ones) equals the local naive join") {
    val g = TestHelpers.randomGraph(nodes = 10, edges = 24, seed = 11)
    val q = QueryLibrary.q1
    val (rdd, _) = MultiwayJoin.execute(spark, rels(q, g), Array(0, 1, 2), Array(1, 1, 1))
    val got = rdd.map(_.toVector).collect().toSet
    assert(got == TestHelpers.naiveJoin(q, TestHelpers.bindGraph(q, g)))
  }

  test("empty input yields an empty result") {
    val q = QueryLibrary.q1
    val empty = Seq.empty[Array[Long]]
    val (rdd, _) = MultiwayJoin.execute(spark, rels(q, empty), Array(0, 1, 2), Array(2, 2, 2))
    assert(rdd.isEmpty())
  }

  test("5-clique query on a graph with one 5-clique finds all 120 embeddings") {
    val clique = (1 to 5).flatMap(x => (1 to 5).filter(_ != x).map(y => Array(x.toLong, y.toLong)))
    val extra  = Seq(Array(6L, 7L), Array(7L, 6L))
    val q = QueryLibrary.q3
    val (rdd, _) = MultiwayJoin.execute(
      spark, rels(q, clique ++ extra), (0 until 5).toArray, Array(2, 2, 1, 1, 1))
    assert(rdd.count() == 120L)
  }
}
