package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.ExpTiering

/** Table III: confusion matrix of the RF tier predictor vs the ideal tier
  * (Hot/Cool, 2-month horizon, ~760 datasets / ~0.7 PB, out-of-time).
  * Table IV: OptAssign (predicted/known) vs intuitive caching baselines.
  */
class TableIII_IVBench extends AnyFunSuite with BenchBase {

  test("Table III: predicted vs ideal tier confusion matrix") {
    banner("Table III", "RF tier prediction, out-of-time, 760 datasets (~0.7 PB), 2-month horizon")
    val (conf, _, _) = ExpTiering.tableIII(spark)
    println("paper:              ours:")
    println("         Hot  Cool           Hot  Cool")
    val p = Vector(Vector(291, 12), Vector(12, 445))
    for (r <- 0 to 1) {
      val label = if (r == 0) "Hot " else "Cool"
      println(f"$label  ${p(r)(0)}%6d ${p(r)(1)}%5d    $label ${conf(r, 0)}%6d ${conf(r, 1)}%5d")
    }
    println(f"paper accuracy=0.968 F1>0.96 | ours accuracy=${conf.accuracy}%.4f macroF1=${conf.macroF1}%.4f")
    assert(conf.total == 760)
    assert(conf.accuracy > 0.93, "paper regime: near-optimal prediction")
    assert(conf.macroF1 > 0.9)
  }

  test("Table IV: OptAssign vs intuitive baselines") {
    banner("Table IV", "% benefit over all-Hot; same storage account as Table III")
    val paper = Vector(
      ("All hot", "N/A", 2, 0.0),
      ("\"Hot\" if data accessed in last 2 mos", "N/A", 4, 2.67),
      ("\"Hot\" if data accessed in last 1 mo", "N/A", 4, 3.25),
      ("Use optimal tier of prev. month", "N/A", 2, 5.07),
      ("OptAssign (Hot, Cool)", "Predicted", 2, 9.570),
      ("OptAssign (Hot, Cool)", "Predicted", 4, 13.58),
      ("OptAssign (Hot, Cool)", "Known", 2, 9.574),
      ("OptAssign (Hot, Cool)", "Known", 4, 13.62),
      ("OptAssign (Hot, Cool)", "Known", 6, 15.39),
      ("OptAssign (Hot, Cool, Archive)", "Known", 6, 43.8),
    )
    val rows = ExpTiering.tableIV(spark)
    println(f"${"Model"}%-42s ${"Access"}%-10s ${"Mo"}%3s ${"paper %%"}%8s ${"ours %%"}%8s")
    rows.zip(paper).foreach { case (r, (m, a, mo, pb)) =>
      assert(r.model == m && r.accessInfo == a && r.months == mo)
      println(f"${r.model}%-42s ${r.accessInfo}%-10s ${r.months}%3d $pb%8.2f ${r.benefitPct}%8.2f")
    }
    def b(model: String, info: String, mo: Int) =
      rows.find(r => r.model == model && r.accessInfo == info && r.months == mo).get.benefitPct
    // Shape: caching rules << OptAssign; predicted ~ known; Archive largest.
    assert(math.abs(b("All hot", "N/A", 2)) < 1e-9)
    val bestCache = Seq(b("\"Hot\" if data accessed in last 2 mos", "N/A", 4),
      b("\"Hot\" if data accessed in last 1 mo", "N/A", 4)).max
    assert(b("OptAssign (Hot, Cool)", "Known", 4) > bestCache + 1)
    assert(b("OptAssign (Hot, Cool)", "Predicted", 2) > 0.8 * b("OptAssign (Hot, Cool)", "Known", 2))
    assert(b("OptAssign (Hot, Cool, Archive)", "Known", 6) >
      1.5 * b("OptAssign (Hot, Cool)", "Known", 6))
  }
}
