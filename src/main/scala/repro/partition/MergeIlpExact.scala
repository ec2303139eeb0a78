package repro.partition

/** Exact solver for MERGE PARTITIONS (eq. (2)) on small instances — the
  * test oracle for G-PART and OrderedDP.
  *
  * The ILP allows covering an initial partition with more than one chosen
  * merge, but any such solution is dominated by the set partition obtained
  * by dropping duplicate coverage (span and cost are both monotone in merge
  * contents), so enumerating set partitions of the initial partitions is
  * exact. Bell(10) = 115975 keeps this tractable for test sizes.
  */
object MergeIlpExact {

  final case class Solution(merges: Vector[Part], spaceRows: Long, cost: Double)

  /** Minimum-space grouping with total cost <= costThresh; None if even the
    * all-singletons grouping violates the threshold.
    *
    * @param feasiblePair optional merge-feasibility predicate (pairwise, as
    *                     in the paper's access-compatibility definition);
    *                     groups containing an incompatible pair are skipped.
    */
  def solve(parts: IndexedSeq[Part], cat: FileCatalog, costThresh: Double,
            feasiblePair: (Part, Part) => Boolean = (_, _) => true): Option[Solution] = {
    val n = parts.length
    require(n <= 10, "exact solver is exponential; keep N <= 10")

    var best: Option[Solution] = None

    // Enumerate set partitions via restricted growth strings.
    val assign = new Array[Int](n)
    def rec(i: Int, maxG: Int): Unit = {
      if (i == n) {
        val groups = (0 until maxG).map(g => (0 until n).filter(assign(_) == g))
        var nextId = 10_000
        val merges = groups.map { idxs =>
          var m = parts(idxs.head)
          for (j <- idxs.tail) { m = m.merge(parts(j), nextId); nextId += 1 }
          m
        }.toVector
        val ok = groups.forall(idxs =>
          idxs.combinations(2).forall { case Seq(a, b) => feasiblePair(parts(a), parts(b)) })
        if (ok) {
          val cost = Part.totalCost(merges, cat)
          if (cost <= costThresh + 1e-9) {
            val space = Part.totalSpaceRows(merges, cat)
            if (best.forall(_.spaceRows > space)) best = Some(Solution(merges, space, cost))
          }
        }
      } else {
        for (g <- 0 to maxG) {
          assign(i) = g
          rec(i + 1, math.max(maxG, g + 1))
        }
      }
    }
    rec(0, 0)
    best
  }
}
