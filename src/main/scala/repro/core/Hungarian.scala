package repro.core

/** O(n^2 m) Hungarian algorithm (Jonker-style potentials) for min-cost
  * assignment on an n x m cost matrix with n <= m. Forbidden edges are
  * encoded as [[Hungarian.Forbidden]]; a row that can only match forbidden
  * columns makes the instance infeasible.
  *
  * This is the substrate for Theorem 2 (equal-sized partitions, no
  * compression — optimal tiering via min-weight bipartite matching).
  */
object Hungarian {

  /** Cost marking an inadmissible (row, col) pair. Large but finite so the
    * potentials stay well-conditioned; feasibility is checked afterwards.
    */
  val Forbidden: Double = 1e15

  /** Solves min-cost assignment. Returns, for each row, the matched column,
    * or None if some row can only be matched through forbidden edges.
    */
  def solve(cost: Array[Array[Double]]): Option[Array[Int]] = {
    val n = cost.length
    if (n == 0) return Some(Array.empty)
    val m = cost(0).length
    require(n <= m, s"Hungarian needs rows <= cols, got $n x $m")

    // 1-based potentials over rows (u) and columns (v); p(j) = row matched to col j.
    val u    = new Array[Double](n + 1)
    val v    = new Array[Double](m + 1)
    val p    = Array.fill(m + 1)(0)
    val way  = new Array[Int](m + 1)

    for (i <- 1 to n) {
      p(0) = i
      var j0 = 0
      val minv = Array.fill(m + 1)(Double.PositiveInfinity)
      val used = Array.fill(m + 1)(false)
      var continue = true
      while (continue) {
        used(j0) = true
        val i0 = p(j0)
        var delta = Double.PositiveInfinity
        var j1    = -1
        var j     = 1
        while (j <= m) {
          if (!used(j)) {
            val cur = cost(i0 - 1)(j - 1) - u(i0) - v(j)
            if (cur < minv(j)) { minv(j) = cur; way(j) = j0 }
            if (minv(j) < delta) { delta = minv(j); j1 = j }
          }
          j += 1
        }
        var jj = 0
        while (jj <= m) {
          if (used(jj)) { u(p(jj)) += delta; v(jj) -= delta }
          else minv(jj) -= delta
          jj += 1
        }
        j0 = j1
        if (p(j0) == 0) continue = false
      }
      // augment along the alternating path
      var done = false
      while (!done) {
        val j1 = way(j0)
        p(j0) = p(j1)
        j0 = j1
        if (j0 == 0) done = true
      }
    }

    val rowToCol = new Array[Int](n)
    for (j <- 1 to m if p(j) != 0) rowToCol(p(j) - 1) = j - 1
    val feasible = rowToCol.indices.forall(i => cost(i)(rowToCol(i)) < Forbidden / 2)
    if (feasible) Some(rowToCol) else None
  }

  /** Total cost of an assignment produced by [[solve]]. */
  def costOf(cost: Array[Array[Double]], rowToCol: Array[Int]): Double =
    rowToCol.indices.iterator.map(i => cost(i)(rowToCol(i))).sum
}
