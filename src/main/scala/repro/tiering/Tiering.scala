package repro.tiering

import repro.core._

/** Bridges the enterprise simulator to OPTASSIGN with K = 0 (tiering only),
  * exactly the Section IV-C setting: datasets are the partitions, the
  * platform baseline keeps everything Hot, and the projected number of
  * accesses over the billing horizon drives the tier choice.
  */
object Tiering {

  /** SLA: a dataset expected to be read must be servable in minutes, which
    * rules out Archive (TTFB 1 h); unread data has no latency requirement.
    */
  val accessedSlaSec: Double = 120.0

  /** Sum of reads in months [t0, t0 + horizon). */
  def futureAccesses(ds: EnterpriseSim.Dataset, t0: Int, horizon: Int): Double =
    (t0 until math.min(t0 + horizon, ds.reads.length)).map(ds.reads).sum

  /** Builds the OPTASSIGN instance (K = 0) for an account at month t0.
    *
    * @param tiers     tier menu for the run (e.g. CostModel.hotCool);
    *                  Archive is only ever offered when horizon >= its
    *                  6-month early-deletion period
    * @param hotIdx    index of Hot within `tiers` (the current tier of all
    *                  datasets — platform default)
    * @param accesses  projected accesses per dataset id (predicted or known)
    */
  def instance(acc: EnterpriseSim.Account, tiers: Vector[Tier], hotIdx: Int,
               horizon: Int, accesses: Map[Int, Double]): OptAssignInstance = {
    val usable =
      if (tiers.exists(_.name == "Archive") && horizon < CostModel.Archive.earlyDeletionMonths)
        tiers.filterNot(_.name == "Archive")
      else tiers
    val parts = acc.datasets.map { ds =>
      val rho = accesses.getOrElse(ds.id, 0.0)
      PartitionStat(
        id = ds.id,
        sizeGB = ds.sizeGB,
        accesses = rho,
        latencySlaSec = if (rho > 0) accessedSlaSec else Double.PositiveInfinity,
        currentTier = hotIdx,
        currentCodec = 0,
        codecPerfs = Vector(CodecPerf.identity),
      )
    }
    OptAssignInstance(parts, usable, Vector.fill(usable.length)(Double.PositiveInfinity),
      CostWeights(), months = horizon.toDouble)
  }

  /** Known (ground-truth) projected accesses for [t0, t0+horizon). */
  def knownAccesses(acc: EnterpriseSim.Account, t0: Int, horizon: Int): Map[Int, Double] =
    acc.datasets.map(ds => ds.id -> futureAccesses(ds, t0, horizon)).toMap

  /** Cost of the all-Hot platform baseline: no tier change, Hot storage +
    * Hot reads — evaluated against *actual* accesses.
    */
  def allHotAssignment(inst: OptAssignInstance, hotIdx: Int): Vector[Assignment] =
    inst.parts.map(p => Assignment(p.id, hotIdx, 0)).toVector

  /** Evaluates an assignment against the *actual* future accesses (the
    * paper's "% benefit after making errors"): predictions choose the tier,
    * reality bills it.
    */
  def actualCost(inst: OptAssignInstance, assignment: Seq[Assignment],
                 actualAccesses: Map[Int, Double]): Double = {
    val billed = inst.copy(parts = inst.parts.map(p =>
      p.copy(accesses = actualAccesses.getOrElse(p.id, 0.0),
             latencySlaSec = Double.PositiveInfinity)))
    OptAssign.totalCost(billed, assignment)
  }

  /** % cost benefit of `assignment` over all-Hot under actual accesses. */
  def benefitPct(inst: OptAssignInstance, hotIdx: Int, assignment: Seq[Assignment],
                 actualAccesses: Map[Int, Double]): Double = {
    val base = actualCost(inst, allHotAssignment(inst, hotIdx), actualAccesses)
    val got  = actualCost(inst, assignment, actualAccesses)
    (base - got) / base * 100.0
  }

  /** OPTASSIGN's tier choice per dataset (greedy is optimal here — no
    * capacity bounds, Theorem 3).
    */
  def optAssignTiers(inst: OptAssignInstance): Vector[Assignment] =
    OptAssign.greedyUnbounded(inst).getOrElse(
      throw new IllegalStateException("tiering instance must be feasible"))
}
