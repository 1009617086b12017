package repro.core.ghd

import org.scalatest.funsuite.AnyFunSuite

import repro.core.adj.Optimizer
import repro.core.hypergraph.QueryLibrary

/** Regression tests for the Q5/Q6 decomposition shape and the bag-sub-join
  * attribute order — a global plan order applied to a bag sub-query left an
  * attribute unconstrained for several levels and blew the pre-computation
  * up into a near cross product.
  */
class GHDQ6Spec extends AnyFunSuite {

  test("Q6 decomposes into the triangle bag {abe} plus the chorded bag {bcde}") {
    val q = QueryLibrary.q6
    val t = GHD.decompose(q)
    val byAttrs = t.nodes.map(n => n.attrs.map(q.attributes)).toSet
    assert(byAttrs == Set(Set("a", "b", "e"), Set("b", "c", "d", "e")), t.toString)
    val widths = t.nodes.map(_.width).sorted
    assert(math.abs(widths.head - 1.5) < 1e-6 && math.abs(widths.last - 2.0) < 1e-6)
  }

  test("Q5 decomposes into three arity-3 bags including the {abe} triangle") {
    // Q5's extra bd chord admits a finer tree than Q6's: {abe}, {bcd}, {bde},
    // with maximum bag arity 3 (beating any 4-attribute bag on the
    // tie-break) — all bags stay within width 2.
    val q = QueryLibrary.q5
    val t = GHD.decompose(q)
    val byAttrs = t.nodes.map(n => n.attrs.map(q.attributes)).toSet
    assert(byAttrs == Set(Set("a", "b", "e"), Set("b", "c", "d"), Set("b", "d", "e")),
      t.toString)
    assert(t.maxWidth <= 2.0 + 1e-6)
  }

  test("sum-of-widths tie-break does not disturb the Fig. 5 example") {
    import repro.core.hypergraph.{Atom, Hypergraph}
    val q = Hypergraph(Vector(
      Atom("R1", Vector("a", "b", "c")),
      Atom("R2", Vector("a", "d")),
      Atom("R3", Vector("c", "d")),
      Atom("R4", Vector("b", "e")),
      Atom("R5", Vector("c", "e")),
    ))
    val t = GHD.decompose(q)
    assert(t.nodes.map(_.atomIdxs.toSet).toSet == Set(Set(0), Set(1, 2), Set(3, 4)))
  }

  test("connectedOrder keeps every prefix constrained") {
    // The Q6 bcde bag: edges bc, cd, de, bd, ce (attr ids of Q6: b=1 c=2 d=3 e=4).
    val schemas = Seq(Set(1, 2), Set(2, 3), Set(3, 4), Set(1, 3), Set(2, 4))
    val ord = Optimizer.connectedOrder(schemas)
    assert(ord.sorted.toSeq == Seq(1, 2, 3, 4))
    // Every attribute after the first must share a schema with a predecessor.
    ord.drop(1).zipWithIndex.foreach { case (a, i) =>
      val placed = ord.take(i + 1).toSet
      assert(schemas.exists(s => s.contains(a) && s.exists(placed.contains)),
        s"attr $a unconstrained in ${ord.toSeq}")
    }
  }

  test("connectedOrder starts at the highest-degree attribute") {
    // d has degree 3 among {cd, de, bd}.
    val ord = Optimizer.connectedOrder(Seq(Set(2, 3), Set(3, 4), Set(1, 3)))
    assert(ord.head == 3, ord.toSeq.toString)
  }

  test("connectedOrder handles a single schema") {
    val ord = Optimizer.connectedOrder(Seq(Set(7, 2)))
    assert(ord.sorted.toSeq == Seq(2, 7))
  }
}
