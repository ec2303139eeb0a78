package repro.tiering

import repro.core.{Assignment, OptAssignInstance}

/** The intuitive / caching-inspired tiering baselines of Table IV.
  * Each returns a tier assignment over the instance's datasets; benefits
  * are always evaluated against actual future accesses via
  * [[Tiering.benefitPct]].
  */
object TieringBaselines {

  /** Row 1: keep everything Hot (the platform default). */
  def allHot(inst: OptAssignInstance, hotIdx: Int): Vector[Assignment] =
    Tiering.allHotAssignment(inst, hotIdx)

  /** Rows 2–3: cache rule — Hot iff the dataset was read at least once in
    * the last `window` months before t0, else Cool.
    */
  def hotIfAccessedRecently(acc: EnterpriseSim.Account, inst: OptAssignInstance,
                            hotIdx: Int, coolIdx: Int, t0: Int, window: Int): Vector[Assignment] =
    acc.datasets.map { ds =>
      val recent = (math.max(0, t0 - window) until t0).map(ds.reads).sum
      Assignment(ds.id, if (recent > 0) hotIdx else coolIdx, 0)
    }.toVector

  /** Row 4: reuse last month's optimal tier — OPTASSIGN run on the single
    * month before t0 as if it predicted the future.
    */
  def prevMonthOptimal(acc: EnterpriseSim.Account, inst: OptAssignInstance,
                       hotIdx: Int, t0: Int): Vector[Assignment] = {
    val prevAccesses = acc.datasets.map { ds =>
      ds.id -> (if (t0 >= 1) ds.reads(t0 - 1) else 0.0)
    }.toMap
    val prevInst = Tiering.instance(acc, inst.tiers.toVector, hotIdx, 1, prevAccesses)
    Tiering.optAssignTiers(prevInst)
  }
}
