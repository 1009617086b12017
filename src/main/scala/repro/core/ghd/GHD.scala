package repro.core.ghd

import repro.core.hypergraph.Hypergraph

/** One hypernode of the hypertree T: a group of atoms of the query, whose
  * join is the node's candidate pre-computed relation (Sec. III-A).
  *
  * @param atomIdxs indices into the query's atom vector (λ(v) in the paper)
  * @param attrs    union of the group's attribute ids (the bag)
  * @param width    fractional edge cover number ρ*(attrs, λ(v) schemas) —
  *                 the AGM exponent bounding |⋈ λ(v)| by |R_max|^width
  */
final case class HyperNode(atomIdxs: Vector[Int], attrs: Set[Int], width: Double)

/** A hypertree decomposition: hypernodes plus join-tree adjacency.
  *
  * Every atom of the query belongs to exactly one hypernode, and the nodes
  * satisfy the running-intersection property, so pre-computing any subset of
  * node joins leaves an (almost) acyclic residual query.
  */
final case class HyperTree(query: Hypergraph, nodes: Vector[HyperNode], edges: Set[(Int, Int)]) {
  /** fhw-style score: the maximum node width. */
  def maxWidth: Double = nodes.map(_.width).max

  def neighbors(i: Int): Set[Int] =
    edges.collect { case (a, b) if a == i => b; case (a, b) if b == i => a }

  /** True iff the given node subset induces a connected subtree (used by the
    * optimizer's valid-traversal-order check; singletons/empty are connected).
    */
  def inducesConnectedSubtree(keep: Set[Int]): Boolean = {
    if (keep.size <= 1) return true
    val start = keep.head
    val seen  = collection.mutable.Set(start)
    val stack = collection.mutable.Stack(start)
    while (stack.nonEmpty) {
      val u = stack.pop()
      neighbors(u).foreach { v =>
        if (keep.contains(v) && !seen.contains(v)) { seen += v; stack.push(v) }
      }
    }
    seen.size == keep.size
  }

  /** Valid traversal orders of all hypernodes: every prefix must induce a
    * connected subtree, so hypernodes are visited along the tree.
    */
  def validTraversalOrders: Seq[Vector[Int]] = {
    def extend(prefix: Vector[Int], rest: Set[Int]): Seq[Vector[Int]] =
      if (rest.isEmpty) Seq(prefix)
      else rest.toSeq.flatMap { v =>
        val ok = prefix.isEmpty || neighbors(v).exists(prefix.contains)
        if (ok) extend(prefix :+ v, rest - v) else Seq.empty
      }
    extend(Vector.empty, nodes.indices.toSet)
  }

  override def toString: String =
    nodes.zipWithIndex.map { case (n, i) =>
      s"v$i{${n.atomIdxs.map(query.atoms(_).name).mkString(",")}; " +
        s"attrs=${n.attrs.toSeq.sorted.map(query.attributes).mkString("")}; w=${n.width}}"
    }.mkString(" | ") + s" edges=$edges"
}

/** Exhaustive GHD search over set partitions of the query's atoms
  * (Sec. III-A): keep partitions whose bags form an α-acyclic hypergraph,
  * score by (max node width, max node arity, node count), minimal first —
  * i.e. minimize the worst pre-computed relation's AGM bound, then prefer
  * small bags and fine granularity.
  *
  * m ≤ 10 atoms in the paper's workload ⇒ Bell(10) ≈ 1.2e5 partitions;
  * per-group widths are memoized so the search runs in well under a second.
  */
object GHD {

  def decompose(q: Hypergraph): HyperTree = {
    val m = q.numAtoms
    val widthCache = collection.mutable.Map.empty[Vector[Int], Double]

    def groupWidth(group: Vector[Int]): Double =
      widthCache.getOrElseUpdate(group, {
        val attrs = group.flatMap(q.edges).toSet
        Simplex.fractionalEdgeCover(attrs, group.map(q.edges))
      })

    var best: Option[(Double, Int, Double, Int, Vector[Vector[Int]])] = None

    // Score order: max width (the paper's criterion — bound the worst
    // pre-computed relation), then max bag arity, then the SUM of widths
    // (prefer e.g. a width-1.5 triangle bag over a width-2 chordless cycle
    // when the maxima tie), then node count.
    def better(cand: (Double, Int, Double, Int, Vector[Vector[Int]])): Boolean = best match {
      case None => true
      case Some((w, arity, sumW, nb, _)) =>
        val (cw, ca, cs, cn, _) = cand
        cw < w - 1e-9 ||
          (cw < w + 1e-9 && (ca < arity ||
            (ca == arity && (cs < sumW - 1e-9 ||
              (cs < sumW + 1e-9 && cn < nb)))))
    }

    // Enumerate set partitions: atom i joins an existing group or opens one.
    def rec(i: Int, groups: Vector[Vector[Int]]): Unit = {
      if (i == m) {
        val bags = groups.map(_.flatMap(q.edges).toSet)
        if (GYO.isAcyclic(bags)) {
          val widths = groups.map(groupWidth)
          val cand = (widths.max, bags.map(_.size).max, widths.sum, groups.length, groups)
          if (better(cand)) best = Some(cand)
        }
      } else {
        // Prune: a partial partition whose widths already exceed the best
        // known maximum cannot win.
        val partialW = if (groups.isEmpty) 0.0 else groups.map(groupWidth).max
        val prune = best.exists { case (w, _, _, _, _) => partialW > w + 1e-9 }
        if (!prune) {
          groups.indices.foreach { g =>
            rec(i + 1, groups.updated(g, groups(g) :+ i))
          }
          rec(i + 1, groups :+ Vector(i))
        }
      }
    }
    rec(0, Vector.empty)

    val groups = best.getOrElse(throw new IllegalStateException(
      s"no acyclic decomposition found for $q — the trivial single bag is always acyclic"))._5
    val nodes = groups.map { g =>
      HyperNode(g, g.flatMap(q.edges).toSet, groupWidth(g))
    }
    val edges = GYO.joinTree(nodes.map(_.attrs))
    require(GYO.hasRunningIntersection(nodes.map(_.attrs), edges),
      s"join tree lost running intersection for $q: $nodes / $edges")
    HyperTree(q, nodes, edges)
  }
}
