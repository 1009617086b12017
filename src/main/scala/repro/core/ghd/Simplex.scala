package repro.core.ghd

/** A tiny dense primal simplex for LPs in the form
  *
  *   maximize  c·x   subject to  A·x ≤ b,  x ≥ 0,   with b ≥ 0.
  *
  * `b ≥ 0` means the all-slack basis is feasible, so no phase-1 is needed.
  * This is all the GHD search requires: the fractional edge cover number
  * ρ*(S) of an attribute set S equals (by LP duality) the optimum of the
  * fractional *vertex packing* LP — maximize Σ_v y_v s.t. Σ_{v∈e} y_v ≤ 1
  * per hyperedge e — whose right-hand side is the all-ones vector.
  *
  * Bland's pivoting rule is used, so the method terminates on degenerate
  * tableaus. Sizes here are tiny (≤ ~10 variables / constraints).
  */
object Simplex {

  private val Eps = 1e-9

  /** Maximizes c·x s.t. A·x ≤ b, x ≥ 0 (requires b ≥ 0).
    *
    * @return (optimal objective value, optimal x), or None if unbounded.
    */
  def maximize(a: Array[Array[Double]], b: Array[Double], c: Array[Double]): Option[(Double, Array[Double])] = {
    val m = b.length            // constraints
    val n = c.length            // original variables
    require(a.length == m && a.forall(_.length == n), "dimension mismatch")
    require(b.forall(_ >= -Eps), "simplex requires b >= 0 (all-slack start)")

    // Tableau: m rows of [A | I | b], objective row [-c | 0 | 0].
    val cols = n + m + 1
    val t    = Array.ofDim[Double](m + 1, cols)
    for (i <- 0 until m) {
      System.arraycopy(a(i), 0, t(i), 0, n)
      t(i)(n + i)    = 1.0
      t(i)(cols - 1) = b(i)
    }
    for (j <- 0 until n) t(m)(j) = -c(j)

    val basis = Array.tabulate(m)(i => n + i)

    var guard = 0
    while (guard < 10000) {
      guard += 1
      // Bland: entering column = lowest index with negative reduced cost.
      var enter = -1
      var j = 0
      while (j < cols - 1 && enter < 0) {
        if (t(m)(j) < -Eps) enter = j
        j += 1
      }
      if (enter < 0) {
        // Optimal: read off solution.
        val x = new Array[Double](n)
        for (i <- 0 until m if basis(i) < n) x(basis(i)) = t(i)(cols - 1)
        return Some((t(m)(cols - 1), x))
      }
      // Ratio test; Bland tie-break on basis index.
      var leave = -1
      var best  = Double.PositiveInfinity
      for (i <- 0 until m if t(i)(enter) > Eps) {
        val ratio = t(i)(cols - 1) / t(i)(enter)
        if (ratio < best - Eps || (math.abs(ratio - best) <= Eps &&
            (leave < 0 || basis(i) < basis(leave)))) {
          best = ratio; leave = i
        }
      }
      if (leave < 0) return None // unbounded
      // Pivot on (leave, enter).
      val piv = t(leave)(enter)
      for (j2 <- 0 until cols) t(leave)(j2) /= piv
      for (i <- 0 to m if i != leave) {
        val f = t(i)(enter)
        if (math.abs(f) > Eps) {
          for (j2 <- 0 until cols) t(i)(j2) -= f * t(leave)(j2)
        }
      }
      basis(leave) = enter
    }
    throw new IllegalStateException("simplex failed to converge (cycling guard hit)")
  }

  /** Fractional edge cover number ρ*(vertices, edges): the minimum total
    * weight over edges such that every vertex is covered with weight ≥ 1.
    * Computed through the dual packing LP (see class doc). Vertices not
    * touched by any edge make the cover infeasible — the caller must pass
    * a coverable set.
    */
  def fractionalEdgeCover(vertices: Set[Int], edges: Seq[Set[Int]]): Double = {
    val vs = vertices.toArray.sorted
    if (vs.isEmpty) return 0.0
    require(vs.forall(v => edges.exists(_.contains(v))),
      s"uncoverable vertex among $vertices for edges $edges")
    val vIdx = vs.zipWithIndex.toMap
    // Dual: maximize sum y_v s.t. for each edge e, sum_{v in e∩S} y_v <= 1.
    val a = edges.map { e =>
      val row = new Array[Double](vs.length)
      e.foreach(v => vIdx.get(v).foreach(i => row(i) = 1.0))
      row
    }.toArray
    val b = Array.fill(edges.length)(1.0)
    val c = Array.fill(vs.length)(1.0)
    maximize(a, b, c) match {
      case Some((opt, _)) => opt
      case None           => throw new IllegalStateException("packing LP unbounded — impossible with 0/1 rows")
    }
  }
}
