package repro.data

import org.scalatest.funsuite.AnyFunSuite

/** Pure tests of the Barabási–Albert + triangle-closure generator backing
  * the six dataset specs (no Spark needed).
  */
class ScaleFreeSpec extends AnyFunSuite {

  private def degrees(edges: Seq[(Long, Long)]): Map[Long, Int] =
    edges.flatMap(e => Seq(e._1, e._2)).groupBy(identity).view.mapValues(_.size).toMap

  test("generation is deterministic in the seed") {
    val a = GraphData.scaleFreeEdges(500, 4, 0.3, 7)
    val b = GraphData.scaleFreeEdges(500, 4, 0.3, 7)
    assert(a == b)
    val c = GraphData.scaleFreeEdges(500, 4, 0.3, 8)
    assert(a != c)
  }

  test("edge count is m per grown vertex plus the seed clique") {
    val n = 300; val m = 5
    val edges = GraphData.scaleFreeEdges(n, m, 0.3, 1)
    val expected = m * (m + 1) / 2 + (n - (m + 1)) * m
    assert(edges.length == expected)
  }

  test("edges are duplicate-free with v < u and no self-loops") {
    val edges = GraphData.scaleFreeEdges(400, 3, 0.3, 2)
    assert(edges.distinct.length == edges.length)
    edges.foreach { case (u, v) => assert(v < u, s"($u,$v)") }
  }

  test("vertex ids are 1-based and within the node count") {
    val edges = GraphData.scaleFreeEdges(200, 3, 0.3, 3)
    edges.foreach { case (u, v) =>
      assert(u >= 1 && u <= 200 && v >= 1 && v <= 200)
    }
  }

  test("degree distribution is heavy-tailed (max degree far above the median)") {
    val edges = GraphData.scaleFreeEdges(5000, 5, 0.3, 4)
    val degs = degrees(edges).values.toSeq.sorted.reverse
    assert(degs.head >= 8 * degs(degs.length / 2),
      s"max ${degs.head} vs median ${degs(degs.length / 2)}")
  }

  test("triangle closure produces triangles on the order of the edge count") {
    val edges = GraphData.scaleFreeEdges(2000, 5, 0.3, 5)
    val adj = edges.flatMap(e => Seq(e, e.swap)).groupBy(_._1)
      .view.mapValues(_.map(_._2).toSet).toMap
    val triangles = edges.count { case (u, v) =>
      adj(u).intersect(adj(v)).nonEmpty
    }
    // With closure 0.3 a healthy fraction of edges participate in a triangle,
    // but the graph is far from a clique-like Zipf hub ball.
    assert(triangles > edges.length / 10, s"$triangles of ${edges.length}")
  }

  test("closure 0 still yields a connected heavy-tailed graph") {
    val edges = GraphData.scaleFreeEdges(1000, 3, 0.0, 6)
    assert(edges.length == 3 * (1000 - 4) + 6)
    val degs = degrees(edges)
    assert(degs.size == 1000) // every vertex has at least one edge
  }

  test("parameter validation") {
    intercept[IllegalArgumentException](GraphData.scaleFreeEdges(3, 5, 0.3, 1))
  }
}
