package repro.tiering

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.CostModel

class AccessPredictorSpec extends AnyFunSuite with SparkSpec {

  private lazy val acc = EnterpriseSim.account("p", nDatasets = 250, totalPB = 0.1,
    nMonths = 20, seed = 97)

  test("idealTiers: cold datasets are labelled Cool, hot readers Hot") {
    val ideal = AccessPredictor.idealTiers(acc, CostModel.hotCool, 0, t0 = 12, horizon = 2)
    val known = Tiering.knownAccesses(acc, 12, 2)
    val cold = acc.datasets.filter(d => known(d.id) == 0)
    assert(cold.nonEmpty)
    cold.foreach(d => assert(ideal(d.id) == 1, s"cold ${d.id} should be Cool"))
  }

  test("out-of-time RF predictor is near-ideal (accuracy > 0.85, macro-F1 > 0.8)") {
    val (pred, conf) = AccessPredictor.trainEval(spark, acc, CostModel.hotCool, 0,
      trainT0s = Seq(8, 10, 12), testT0 = 14, horizon = 2)
    assert(conf.total == acc.datasets.length)
    assert(conf.accuracy > 0.85, s"accuracy ${conf.accuracy}")
    assert(conf.macroF1 > 0.8, s"macroF1 ${conf.macroF1}")
    assert(pred.size == acc.datasets.length)
  }

  test("training windows must precede the test window") {
    assertThrows[IllegalArgumentException] {
      AccessPredictor.trainEval(spark, acc, CostModel.hotCool, 0,
        trainT0s = Seq(14), testT0 = 12, horizon = 2)
    }
  }

  test("confusion-matrix arithmetic") {
    val c = AccessPredictor.Confusion(Vector("Hot", "Cool"),
      Map((0, 0) -> 291L, (0, 1) -> 12L, (1, 0) -> 12L, (1, 1) -> 445L))
    assert(c.total == 760)
    assert(math.abs(c.accuracy - 736.0 / 760) < 1e-12)
    assert(c.f1(0) > 0.95 && c.f1(1) > 0.96) // the paper's F1 > 0.96 regime
  }

  test("labelled() joins features with the ideal-tier label without leakage") {
    val df = AccessPredictor.labelled(spark, acc, CostModel.hotCool, 0, t0 = 12, horizon = 2)
    assert(df.count() == acc.datasets.length)
    assert(df.columns.contains("label"))
  }
}
