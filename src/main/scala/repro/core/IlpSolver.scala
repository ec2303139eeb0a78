package repro.core

/** Exact branch-and-bound solver for OPTASSIGN (the ILP of eq. (1)).
  *
  * Intended as a test oracle and for the paper-scale instances (L <= 4,
  * K <= 4, N up to a few hundred with loose capacities): partitions are
  * branched in decreasing-size order, options are explored cheapest-first,
  * and nodes are pruned with the bound (cost so far + sum over remaining
  * partitions of their cheapest feasible option, capacities ignored).
  */
object IlpSolver {

  /** Returns a provably optimal assignment, or None if the instance is
    * infeasible (latency or capacity).
    *
    * @param nodeLimit safety valve on explored nodes; an exception is thrown
    *                  if exceeded so tests never silently accept a suboptimal
    *                  answer.
    */
  def solveExact(inst: OptAssignInstance, nodeLimit: Long = 20_000_000L): Option[Vector[Assignment]] = {
    val order = inst.parts.sortBy(p => -p.sizeGB)
    val opts  = order.map(p => OptAssign.feasibleOptions(inst, p))
    if (opts.exists(_.isEmpty)) return None

    val n = order.length
    // minTail(i) = sum of cheapest options for partitions i..n-1 (capacity-relaxed bound)
    val minTail = new Array[Double](n + 1)
    for (i <- (n - 1) to 0 by -1) minTail(i) = minTail(i + 1) + opts(i).head._3

    var best: Option[Array[(Int, Int)]] = None
    var bestCost = Double.PositiveInfinity
    val cur      = new Array[(Int, Int)](n)
    val capLeft  = inst.capacityGB.toArray
    var nodes    = 0L

    def rec(i: Int, acc: Double): Unit = {
      nodes += 1
      if (nodes > nodeLimit)
        throw new IllegalStateException(s"IlpSolver node limit $nodeLimit exceeded")
      if (acc + minTail(i) >= bestCost) return
      if (i == n) { bestCost = acc; best = Some(cur.clone()); return }
      val p = order(i)
      for ((l, k, c) <- opts(i)) {
        val s = OptAssign.storedGB(p, k)
        if (s <= capLeft(l) + 1e-9 && acc + c + minTail(i + 1) < bestCost) {
          capLeft(l) -= s
          cur(i) = (l, k)
          rec(i + 1, acc + c)
          capLeft(l) += s
        }
      }
    }

    rec(0, 0.0)
    best.map { sol =>
      order.indices.map(i => Assignment(order(i).id, sol(i)._1, sol(i)._2)).toVector.sortBy(_.id)
    }
  }
}
