package repro.core.hcube

import repro.SparkSpec
import repro.core.TestHelpers

class HCubeSpec extends SparkSpec {

  test("hash is stable and in range") {
    for (v <- Seq(0L, 1L, -5L, Long.MaxValue, Long.MinValue); b <- Seq(1, 2, 3, 7)) {
      val h = HCube.hash(v, b)
      assert(h >= 0 && h < b)
      assert(h == HCube.hash(v, b))
    }
  }

  test("hash with one bucket is always 0") {
    for (v <- -10L to 10L) assert(HCube.hash(v, 1) == 0)
  }

  test("cubesFor pins bound dimensions and spans free ones") {
    val p = Array(2, 2, 2)
    // Relation on attrs {0}: free dims 1, 2 → 4 cubes.
    val cubes = HCube.cubesFor(Vector(0), Array(7L), p)
    assert(cubes.length == 4)
    assert(cubes.distinct.length == 4)
    // All cubes share the same attr-0 coordinate.
    val c0 = HCube.hash(7L, 2)
    cubes.foreach(c => assert(c / 4 == c0))
  }

  test("cubesFor with all attributes bound yields exactly one cube") {
    val p = Array(2, 3, 2)
    val cubes = HCube.cubesFor(Vector(0, 1, 2), Array(1L, 2L, 3L), p)
    assert(cubes.length == 1)
    assert(cubes.head >= 0 && cubes.head < p.product)
  }

  test("cubesFor covers every output coordinate exactly once per tuple pair") {
    // For any joinable pair (t of R(a,b), s of S(b,c)), there must exist
    // exactly one cube receiving both.
    val p = Array(2, 3, 2)
    val t = Array(4L, 9L)  // R(a,b)
    val s = Array(9L, 5L)  // S(b,c)
    val ct = HCube.cubesFor(Vector(0, 1), t, p).toSet
    val cs = HCube.cubesFor(Vector(1, 2), s, p).toSet
    assert(ct.intersect(cs).size == (1 * 1 * 1) * 1) // pinned a,b and b,c overlap in 1 free-dim choice... a and c pinned by each side
    // Precisely: the common cubes pin a (from t), b (both), c (from s) → 1.
    assert(ct.intersect(cs).size == 1)
  }

  test("push shuffle partitions every copy to its cube id") {
    val sc = spark.sparkContext
    val g  = TestHelpers.randomGraph(10, 20, 1)
    val rel = Rel("R", Vector(0, 1), sc.parallelize(g, 3), g.length.toLong)
    val p = Array(2, 2)
    val out = HCube.shufflePush(Seq(rel), p)
    assert(out.getNumPartitions == 4)
    val ok = out.mapPartitionsWithIndex { (pid, it) =>
      Iterator.single(it.forall(_._1 == pid))
    }.collect()
    assert(ok.forall(identity))
    // Every tuple lands in exactly dup(R,p)=1 cube (both attrs bound).
    assert(out.count() == g.length.toLong)
  }

  test("pull shuffle carries the same tuples as push, in blocks") {
    val sc = spark.sparkContext
    val g  = TestHelpers.randomGraph(12, 30, 2)
    val rel = Rel("R", Vector(0, 1), sc.parallelize(g, 3), g.length.toLong)
    val p = Array(2, 1)
    val push = HCube.shufflePush(Seq(rel), p)
      .map { case (c, (ri, t)) => (c, ri, t.toVector) }.collect().toSet
    val pull = HCube.shufflePull(Seq(rel), p)
      .flatMap { case (c, (ri, block)) => block.map(t => (c, ri, t.toVector)) }
      .collect().toSet
    assert(push == pull)
    // Pull moves fewer shuffle records than push when blocks batch tuples.
    val pushRecords = HCube.shufflePush(Seq(rel), p).count()
    val pullRecords = HCube.shufflePull(Seq(rel), p).count()
    assert(pullRecords <= pushRecords)
  }

  test("unary relation is replicated across the free dimension") {
    val sc  = spark.sparkContext
    val rel = Rel("S", Vector(0), sc.parallelize(Seq(Array(1L), Array(2L)), 1), 2L)
    val p = Array(1, 3) // attr 1 free → every tuple goes to 3 cubes
    assert(HCube.shufflePush(Seq(rel), p).count() == 6L)
  }

  test("two relations meet in the right cubes (joinability preserved)") {
    val sc = spark.sparkContext
    val r = Seq(Array(1L, 2L), Array(3L, 4L))
    val s = Seq(Array(2L, 9L), Array(4L, 7L))
    val rels = Seq(
      Rel("R", Vector(0, 1), sc.parallelize(r, 1), 2L),
      Rel("S", Vector(1, 2), sc.parallelize(s, 1), 2L),
    )
    val p = Array(2, 2, 2)
    val perCube = HCube.shufflePush(rels, p)
      .map { case (c, (ri, t)) => (c, (ri, t.toVector)) }
      .groupByKey().collect().toMap
    // For each joinable pair, some cube holds both tuples.
    for ((rt, st) <- Seq((r(0), s(0)), (r(1), s(1)))) {
      val hit = perCube.values.exists { ts =>
        ts.exists(x => x._1 == 0 && x._2 == rt.toVector) &&
          ts.exists(x => x._1 == 1 && x._2 == st.toVector)
      }
      assert(hit, s"pair ${rt.toVector} / ${st.toVector} never co-located")
    }
  }
}
