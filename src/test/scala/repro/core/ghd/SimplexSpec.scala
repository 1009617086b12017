package repro.core.ghd

import org.scalatest.funsuite.AnyFunSuite

class SimplexSpec extends AnyFunSuite {

  private def fec(vs: Set[Int], es: Set[Int]*): Double =
    Simplex.fractionalEdgeCover(vs, es.toSeq)

  test("simplex solves a textbook 2-variable LP") {
    // max 3x + 5y s.t. x <= 4, 2y <= 12, 3x + 2y <= 18 → opt 36 at (2, 6).
    val res = Simplex.maximize(
      Array(Array(1.0, 0.0), Array(0.0, 2.0), Array(3.0, 2.0)),
      Array(4.0, 12.0, 18.0),
      Array(3.0, 5.0))
    val (opt, x) = res.get
    assert(math.abs(opt - 36.0) < 1e-6)
    assert(math.abs(x(0) - 2.0) < 1e-6 && math.abs(x(1) - 6.0) < 1e-6)
  }

  test("simplex detects unbounded problems") {
    // max x with no binding constraint.
    val res = Simplex.maximize(Array(Array(-1.0)), Array(1.0), Array(1.0))
    assert(res.isEmpty)
  }

  test("simplex handles a degenerate tableau (Bland terminates)") {
    val res = Simplex.maximize(
      Array(Array(1.0, 1.0), Array(1.0, 1.0)),
      Array(1.0, 1.0),
      Array(1.0, 1.0))
    assert(math.abs(res.get._1 - 1.0) < 1e-6)
  }

  test("edge cover of a single edge is 1") {
    assert(math.abs(fec(Set(0, 1), Set(0, 1)) - 1.0) < 1e-6)
  }

  test("edge cover of a triangle is 3/2") {
    assert(math.abs(fec(Set(0, 1, 2), Set(0, 1), Set(1, 2), Set(0, 2)) - 1.5) < 1e-6)
  }

  test("edge cover of a 4-cycle is 2") {
    assert(math.abs(fec(Set(0, 1, 2, 3), Set(0, 1), Set(1, 2), Set(2, 3), Set(3, 0)) - 2.0) < 1e-6)
  }

  test("edge cover of a 5-cycle is 5/2") {
    val es = Seq(Set(0, 1), Set(1, 2), Set(2, 3), Set(3, 4), Set(4, 0))
    assert(math.abs(Simplex.fractionalEdgeCover((0 to 4).toSet, es) - 2.5) < 1e-6)
  }

  test("edge cover of the 4-clique is 2") {
    val es = for (i <- 0 until 4; j <- i + 1 until 4) yield Set(i, j)
    assert(math.abs(Simplex.fractionalEdgeCover((0 to 3).toSet, es) - 2.0) < 1e-6)
  }

  test("edge cover of the 5-clique is 5/2") {
    val es = for (i <- 0 until 5; j <- i + 1 until 5) yield Set(i, j)
    assert(math.abs(Simplex.fractionalEdgeCover((0 to 4).toSet, es) - 2.5) < 1e-6)
  }

  test("edge cover of a 2-path (two edges sharing a vertex) is 2") {
    assert(math.abs(fec(Set(0, 1, 2), Set(0, 1), Set(1, 2)) - 2.0) < 1e-6)
  }

  test("edge cover of a star with 3 leaves is 3") {
    assert(math.abs(fec(Set(0, 1, 2, 3), Set(0, 1), Set(0, 2), Set(0, 3)) - 3.0) < 1e-6)
  }

  test("edge cover restricted to a vertex subset ignores outside vertices") {
    // Cover only {0,1} with edges {0,1},{1,2}: one edge suffices.
    assert(math.abs(fec(Set(0, 1), Set(0, 1), Set(1, 2)) - 1.0) < 1e-6)
  }

  test("edge cover of the empty vertex set is 0") {
    assert(fec(Set.empty[Int], Set(0, 1)) == 0.0)
  }

  test("uncoverable vertex is rejected") {
    intercept[IllegalArgumentException](fec(Set(0, 7), Set(0, 1)))
  }

  test("property: cover of a clique of size k is k/2 (k = 2..7)") {
    for (k <- 2 to 7) {
      val es = for (i <- 0 until k; j <- i + 1 until k) yield Set(i, j)
      val got = Simplex.fractionalEdgeCover((0 until k).toSet, es)
      assert(math.abs(got - k / 2.0) < 1e-6, s"k=$k got $got")
    }
  }

  test("property: edge cover is between 1 and the number of vertices (random instances)") {
    val rnd = new scala.util.Random(31)
    for (_ <- 1 to 50) {
      val n  = 2 + rnd.nextInt(5)
      val m  = 1 + rnd.nextInt(8)
      val es = Vector.fill(m) {
        val i = rnd.nextInt(n); var j = rnd.nextInt(n)
        while (j == i) j = rnd.nextInt(n)
        Set(i, j)
      }
      val covered = es.flatten.toSet
      val got = Simplex.fractionalEdgeCover(covered, es)
      assert(got >= 1.0 - 1e-6 && got <= covered.size + 1e-6, s"es=$es got=$got")
    }
  }

  test("property: adding edges never increases the cover number") {
    for (n <- 3 to 6) {
      val cycle = (0 until n).map(i => Set(i, (i + 1) % n))
      val more  = cycle :+ Set(0, n / 2)
      val a = Simplex.fractionalEdgeCover((0 until n).toSet, cycle)
      val b = Simplex.fractionalEdgeCover((0 until n).toSet, more)
      assert(b <= a + 1e-6)
    }
  }
}
