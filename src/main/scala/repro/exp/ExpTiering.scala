package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.CostModel
import repro.tiering._

/** Harnesses for the enterprise tiering experiments: Table II (% cost
  * benefit across 4 customer accounts), Table III (predicted-vs-ideal tier
  * confusion matrix) and Table IV (OptAssign vs caching baselines).
  * Shared by the spark-submit jobs and the bench suites.
  */
object ExpTiering {

  /** Month at which the billing period starts (12 months of history before
    * it, and >= 6 months of simulated future after it).
    */
  val T0 = 12

  /** Projection from historical logs (Table II's "projected access patterns
    * using historical access logs"): per future month, the max of the
    * 3-month trailing mean and the seasonal lag-6 value — the seasonality
    * component is exactly what the paper says naive recency rules miss
    * ("year-on-year analysis"). Datasets read at all in the last 9 months,
    * and new ingests, are floored at one access so the optimizer never
    * archives anything plausibly live (archive reads are 500x hot reads).
    */
  def projectedAccesses(acc: EnterpriseSim.Account, t0: Int, horizon: Int): Map[Int, Double] = {
    // Domain-knowledge estimate for new ingests (paper: "query patterns on
    // similar historical data"): the account's mean first-month read count.
    val creationReads = acc.datasets.filter(_.createdMonth < t0)
      .map(ds => ds.reads(ds.createdMonth))
    val newIngestEstimate =
      if (creationReads.isEmpty) 1.0 else creationReads.sum / creationReads.length
    acc.datasets.map { ds =>
      val mean3 = (math.max(0, t0 - 3) until t0).map(ds.reads).sum / 3.0
      val pred = (t0 until t0 + horizon).map { m =>
        val seasonal = if (m - 6 >= 0 && m - 6 < t0) ds.reads(m - 6) else 0.0
        math.max(seasonal, mean3)
      }.sum
      val recentlyLive = (math.max(0, t0 - 9) until t0).map(ds.reads).sum > 0
      val isNew        = ds.createdMonth >= t0
      ds.id -> (
        if (isNew) math.max(pred, newIngestEstimate)
        else if (recentlyLive) math.max(pred, 1.0)
        else pred)
    }.toMap
  }

  final case class TableIIRow(customer: String, totalPB: Double,
                              benefit2mo: Double, benefit6mo: Double)

  /** Table II: OPTASSIGN (K=0) % benefit over all-Hot, per account, for
    * 2-month (Hot/Cool — Archive's early-deletion period rules it out) and
    * 6-month (Hot/Cool/Archive) horizons; tiers chosen on projected
    * accesses, billed on actual.
    */
  def tableII(seed: Long = 42): Vector[TableIIRow] =
    EnterpriseSim.tableIIAccounts(seed).map { acc =>
      def benefit(horizon: Int, tiers: Vector[repro.core.Tier]): Double = {
        val inst   = Tiering.instance(acc, tiers, hotIdx = 0, horizon,
          projectedAccesses(acc, T0, horizon))
        val chosen = Tiering.optAssignTiers(inst)
        Tiering.benefitPct(inst, hotIdx = 0, chosen, Tiering.knownAccesses(acc, T0, horizon))
      }
      TableIIRow(acc.name, acc.totalPB,
        benefit(2, CostModel.hotCool),
        benefit(6, CostModel.hotCoolArchive))
    }

  /** Table III: out-of-time RF tier prediction (Hot/Cool, 2-month horizon)
    * on the ~760-dataset account. Returns the confusion matrix and the
    * per-dataset predicted tiers (reused by Table IV's "Predicted" rows).
    */
  def tableIII(spark: SparkSession, seed: Long = 77): (AccessPredictor.Confusion, Map[Int, Int],
      EnterpriseSim.Account) = {
    val acc = EnterpriseSim.tableIIIAccount(seed)
    val (pred, conf) = AccessPredictor.trainEval(spark, acc, CostModel.hotCool, hotIdx = 0,
      trainT0s = 6 to 13, testT0 = T0 + 2, horizon = 2)
    (conf, pred, acc)
  }

  final case class TableIVRow(model: String, accessInfo: String, months: Int, benefitPct: Double)

  /** Table IV: % benefit over all-Hot for the caching baselines and
    * OptAssign with predicted / known access information, across horizons.
    * All rows are billed against actual accesses from t0 = T0+2 (the same
    * out-of-time month the predictor is tested on).
    */
  def tableIV(spark: SparkSession, seed: Long = 77): Vector[TableIVRow] = {
    val acc = EnterpriseSim.tableIIIAccount(seed)
    val t0  = T0 + 2
    val hotCool = CostModel.hotCool

    def inst(horizon: Int, tiers: Vector[repro.core.Tier]) =
      Tiering.instance(acc, tiers, hotIdx = 0, horizon, Tiering.knownAccesses(acc, t0, horizon))
    def billed(horizon: Int) = Tiering.knownAccesses(acc, t0, horizon)

    def rfPredictedTiers(horizon: Int): Map[Int, Int] =
      AccessPredictor.trainEval(spark, acc, hotCool, hotIdx = 0,
        trainT0s = 6 to 13, testT0 = t0, horizon = horizon)._1

    def benefitOf(assignment: Vector[repro.core.Assignment], horizon: Int,
                  tiers: Vector[repro.core.Tier]): Double =
      Tiering.benefitPct(inst(horizon, tiers), hotIdx = 0, assignment, billed(horizon))

    val rows = Vector.newBuilder[TableIVRow]

    rows += TableIVRow("All hot", "N/A", 2,
      benefitOf(TieringBaselines.allHot(inst(2, hotCool), 0), 2, hotCool))
    rows += TableIVRow("\"Hot\" if data accessed in last 2 mos", "N/A", 4,
      benefitOf(TieringBaselines.hotIfAccessedRecently(acc, inst(4, hotCool), 0, 1, t0, 2), 4, hotCool))
    rows += TableIVRow("\"Hot\" if data accessed in last 1 mo", "N/A", 4,
      benefitOf(TieringBaselines.hotIfAccessedRecently(acc, inst(4, hotCool), 0, 1, t0, 1), 4, hotCool))
    rows += TableIVRow("Use optimal tier of prev. month", "N/A", 2,
      benefitOf(TieringBaselines.prevMonthOptimal(acc, inst(2, hotCool), 0, t0), 2, hotCool))

    for (h <- Seq(2, 4)) {
      val pred = rfPredictedTiers(h)
      val assignment = acc.datasets.map(ds =>
        repro.core.Assignment(ds.id, pred.getOrElse(ds.id, 0), 0)).toVector
      rows += TableIVRow("OptAssign (Hot, Cool)", "Predicted", h, benefitOf(assignment, h, hotCool))
    }
    for (h <- Seq(2, 4, 6))
      rows += TableIVRow("OptAssign (Hot, Cool)", "Known", h,
        benefitOf(Tiering.optAssignTiers(inst(h, hotCool)), h, hotCool))

    val hca = CostModel.hotCoolArchive
    rows += TableIVRow("OptAssign (Hot, Cool, Archive)", "Known", 6,
      benefitOf(Tiering.optAssignTiers(inst(6, hca)), 6, hca))

    rows.result()
  }
}
