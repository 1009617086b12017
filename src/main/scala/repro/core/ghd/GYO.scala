package repro.core.ghd

/** GYO (Graham / Yu–Ozsoyoglu) machinery for hypergraph acyclicity and
  * join-tree construction over a set of bags (attribute sets).
  */
object GYO {

  /** True iff the hypergraph whose hyperedges are `bags` is α-acyclic:
    * repeated ear removal (drop vertices unique to one bag; drop bags
    * contained in another bag) reduces it to at most one bag.
    */
  def isAcyclic(bags: Seq[Set[Int]]): Boolean = {
    var cur = bags.toVector.filter(_.nonEmpty)
    var changed = true
    while (changed && cur.length > 1) {
      changed = false
      // Drop bags contained in some other bag (one at a time to keep
      // duplicate bags from annihilating each other).
      val sub = cur.indices.find(i => cur.indices.exists(j => j != i && cur(i).subsetOf(cur(j))))
      sub match {
        case Some(i) =>
          cur = cur.patch(i, Nil, 1); changed = true
        case None =>
          // Drop vertices that occur in exactly one bag.
          val counts = cur.flatten.groupBy(identity).view.mapValues(_.size).toMap
          val lonely = counts.collect { case (v, 1) => v }.toSet
          if (lonely.nonEmpty) {
            cur = cur.map(_.diff(lonely)).filter(_.nonEmpty)
            changed = true
          }
      }
    }
    cur.length <= 1
  }

  /** Builds a join tree over the bags via a maximum-weight spanning forest
    * on pairwise shared-attribute counts (Bernstein–Goodman: for an acyclic
    * hypergraph this yields a tree with the running-intersection property).
    *
    * @return adjacency as a set of undirected (i, j) bag-index pairs.
    */
  def joinTree(bags: IndexedSeq[Set[Int]]): Set[(Int, Int)] = {
    val n = bags.length
    if (n <= 1) return Set.empty
    val parent = Array.tabulate(n)(identity)
    def find(x: Int): Int = { var r = x; while (parent(r) != r) r = parent(r); parent(x) = r; r }
    val candidates = for {
      i <- 0 until n; j <- i + 1 until n
      w = bags(i).intersect(bags(j)).size
      if w > 0
    } yield (w, i, j)
    var edges = Set.empty[(Int, Int)]
    for ((_, i, j) <- candidates.sortBy(-_._1)) {
      val (ri, rj) = (find(i), find(j))
      if (ri != rj) { parent(ri) = rj; edges += ((i, j)) }
    }
    edges
  }

  /** True iff, in the tree given by `edges` over `bags`, every attribute's
    * occurrence set induces a connected subtree (running intersection).
    */
  def hasRunningIntersection(bags: IndexedSeq[Set[Int]], edges: Set[(Int, Int)]): Boolean = {
    val n   = bags.length
    if (n <= 1) return true
    val adj = Array.fill(n)(List.empty[Int])
    for ((i, j) <- edges) { adj(i) ::= j; adj(j) ::= i }
    val attrs = bags.flatten.toSet
    attrs.forall { a =>
      val holders = bags.indices.filter(bags(_).contains(a)).toSet
      if (holders.size <= 1) true
      else {
        val start = holders.head
        val seen  = collection.mutable.Set(start)
        val stack = collection.mutable.Stack(start)
        while (stack.nonEmpty) {
          val u = stack.pop()
          adj(u).foreach { v =>
            if (holders.contains(v) && !seen.contains(v)) { seen += v; stack.push(v) }
          }
        }
        seen.size == holders.size
      }
    }
  }
}
