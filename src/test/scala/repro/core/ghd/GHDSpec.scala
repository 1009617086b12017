package repro.core.ghd

import org.scalatest.funsuite.AnyFunSuite

import repro.core.hypergraph.{Atom, Hypergraph, QueryLibrary}

class GHDSpec extends AnyFunSuite {

  private def checkInvariants(t: HyperTree): Unit = {
    val q = t.query
    // Every atom appears in exactly one node.
    val covered = t.nodes.flatMap(_.atomIdxs)
    assert(covered.sorted == q.atoms.indices.toVector, s"atom partition broken: $t")
    // Bags are the unions of their atoms' schemas.
    t.nodes.foreach(n => assert(n.attrs == n.atomIdxs.flatMap(q.edges).toSet))
    // The bags are acyclic and the tree has running intersection.
    assert(GYO.isAcyclic(t.nodes.map(_.attrs)))
    assert(GYO.hasRunningIntersection(t.nodes.map(_.attrs), t.edges))
  }

  test("triangle decomposes into a single bag of width 1.5") {
    val t = GHD.decompose(QueryLibrary.q1)
    checkInvariants(t)
    assert(t.nodes.length == 1)
    assert(math.abs(t.nodes.head.width - 1.5) < 1e-6)
  }

  test("the paper's example query gets the Fig. 5 hypertree") {
    // Q = R1(a,b,c) ⋈ R2(a,d) ⋈ R3(c,d) ⋈ R4(b,e) ⋈ R5(c,e).
    val q = Hypergraph(Vector(
      Atom("R1", Vector("a", "b", "c")),
      Atom("R2", Vector("a", "d")),
      Atom("R3", Vector("c", "d")),
      Atom("R4", Vector("b", "e")),
      Atom("R5", Vector("c", "e")),
    ))
    val t = GHD.decompose(q)
    checkInvariants(t)
    // Fig. 5: v_a = {R1}, v_b = {R2 ⋈ R3}, v_c = {R4 ⋈ R5}.
    val groups = t.nodes.map(_.atomIdxs.toSet).toSet
    assert(groups == Set(Set(0), Set(1, 2), Set(3, 4)), s"got $t")
  }

  test("Q2 decomposition is acyclic with bounded width") {
    val t = GHD.decompose(QueryLibrary.q2)
    checkInvariants(t)
    assert(t.maxWidth <= 2.0 + 1e-6)
  }

  test("Q3 (5-clique) decomposes into a single bag of width 2.5") {
    val t = GHD.decompose(QueryLibrary.q3)
    checkInvariants(t)
    assert(t.nodes.length == 1)
    assert(math.abs(t.maxWidth - 2.5) < 1e-6)
  }

  test("Q4 splits the triangle {ab,ea,be} from the path {bc,cd,de}") {
    val t = GHD.decompose(QueryLibrary.q4)
    checkInvariants(t)
    assert(t.nodes.length >= 2)
    val q = QueryLibrary.q4
    val byAttrs = t.nodes.map(n => n.attrs.map(q.attributes))
    assert(byAttrs.exists(_ == Set("a", "b", "e")), s"got $t")
    assert(t.maxWidth <= 2.0 + 1e-6)
  }

  test("Q5 and Q6 decompositions keep width at most 2") {
    for (q <- Seq(QueryLibrary.q5, QueryLibrary.q6)) {
      val t = GHD.decompose(q)
      checkInvariants(t)
      assert(t.maxWidth <= 2.0 + 1e-6, s"width ${t.maxWidth} for $q")
    }
  }

  test("acyclic queries decompose with width 1 everywhere") {
    for (q <- Seq(QueryLibrary.q7, QueryLibrary.q8, QueryLibrary.q9,
                  QueryLibrary.q10, QueryLibrary.q11)) {
      val t = GHD.decompose(q)
      checkInvariants(t)
      assert(t.maxWidth <= 1.0 + 1e-6, s"width ${t.maxWidth} for $q")
    }
  }

  test("single-atom query decomposes trivially") {
    val t = GHD.decompose(Hypergraph(Vector(Atom("R", Vector("x", "y")))))
    checkInvariants(t)
    assert(t.nodes.length == 1 && t.edges.isEmpty)
  }

  test("valid traversal orders of a path hypertree respect connectivity") {
    val q = QueryLibrary.q4
    val t = GHD.decompose(q)
    val orders = t.validTraversalOrders
    assert(orders.nonEmpty)
    orders.foreach { o =>
      o.indices.foreach { i =>
        assert(t.inducesConnectedSubtree(o.take(i + 1).toSet), s"order $o prefix $i")
      }
    }
  }

  test("valid traversal order count matches tree structure for 3-node path") {
    val q = Hypergraph(Vector(
      Atom("R1", Vector("a", "b", "c")),
      Atom("R2", Vector("a", "d")),
      Atom("R3", Vector("c", "d")),
      Atom("R4", Vector("b", "e")),
      Atom("R5", Vector("c", "e")),
    ))
    val t = GHD.decompose(q)
    // A path u - v - w admits 4 connected traversals: uvw, wvu, vuw, vwu.
    assert(t.validTraversalOrders.length == 4)
  }

  test("inducesConnectedSubtree on singleton and empty sets") {
    val t = GHD.decompose(QueryLibrary.q4)
    assert(t.inducesConnectedSubtree(Set.empty))
    assert(t.inducesConnectedSubtree(Set(0)))
  }
}
