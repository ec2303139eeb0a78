package repro.core

/** Theorem 2: optimal tiering for equal-sized partitions with no compression,
  * via min-weight bipartite matching (Fig. 6(b) construction).
  *
  * Each tier l contributes Z_l = min(N, floor(S_l / S)) copy-nodes; an edge
  * (partition, tier-copy) exists iff the tier's TTFB satisfies the
  * partition's latency SLA, weighted by the eq. (1) storage + read (+ write)
  * cost of placing the partition there. The Hungarian matching over this
  * graph is feasible and optimal (see paper, Section IV-B1).
  */
object BipartiteAssign {

  /** Solves the equal-size / no-compression special case exactly.
    *
    * All partitions in `inst` must share the same sizeGB and have the
    * identity codec only (K = 0 in paper terms means "no compression
    * choice": exactly the identity scheme).
    *
    * @return per-partition tier assignment (codec fixed to 0), or None if
    *         infeasible (capacity or latency).
    */
  def solve(inst: OptAssignInstance): Option[Vector[Assignment]] = {
    val parts = inst.parts
    require(parts.nonEmpty, "empty instance")
    val s = parts.head.sizeGB
    require(parts.forall(p => math.abs(p.sizeGB - s) < 1e-12), "partitions must be equal-sized")
    require(parts.forall(_.codecPerfs.length == 1), "no compression schemes allowed (K=0)")

    val n = parts.length
    // Z_l copies of each tier, capped at N.
    val copies: IndexedSeq[(Int, Int)] = for { // (tier, copyIdx)
      l <- inst.tiers.indices
      // +1e-9: guard against 3*s/s = 2.9999... losing a copy to float error
      z = math.min(n.toLong, math.floor(inst.capacityGB(l) / s + 1e-9).toLong).toInt
      c <- 0 until z
    } yield (l, c)

    if (copies.length < n) return None // not enough capacity for all partitions

    val cost = Array.tabulate(n, copies.length) { (i, j) =>
      val p = parts(i)
      val l = copies(j)._1
      if (OptAssign.latencyOk(inst, p, l, 0)) OptAssign.costOf(inst, p, l, 0)
      else Hungarian.Forbidden
    }
    Hungarian.solve(cost).map { rowToCol =>
      parts.indices.map(i => Assignment(parts(i).id, copies(rowToCol(i))._1, 0)).toVector.sortBy(_.id)
    }
  }
}
