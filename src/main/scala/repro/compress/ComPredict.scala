package repro.compress

import org.apache.spark.ml.feature.VectorAssembler
import org.apache.spark.ml.linalg.Vectors
import org.apache.spark.ml.regression.{GBTRegressor, LinearRegression, RandomForestRegressor}
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.CodecPerf

/** COMPREDICT (Section V): learn compression ratio and decompression speed
  * per (layout, codec) from per-sample features.
  *
  * Model zoo (MLlib stand-ins for the paper's sklearn set — see DESIGN.md):
  * Averaging (naive), RandomForest, GBT (≈XGBoost), Linear (≈SVR-linear).
  */
object ComPredict {

  /** One labelled example: features + both regression targets. */
  final case class Example(tag: String, features: Array[Double], ratio: Double,
                           decompSecPerGB: Double)

  /** Regression quality metrics used throughout the paper's Tables V–VIII. */
  final case class RegMetrics(mae: Double, mape: Double, r2: Double) {
    override def toString: String = f"MAE=$mae%.3f MAPE=$mape%.3f R2=$r2%.3f"
  }

  def metrics(pred: Seq[Double], actual: Seq[Double]): RegMetrics = {
    require(pred.length == actual.length && pred.nonEmpty, "prediction/label length mismatch")
    val n    = pred.length
    val mae  = pred.zip(actual).map { case (p, a) => math.abs(p - a) }.sum / n
    val mape = pred.zip(actual).map { case (p, a) => math.abs(p - a) / math.max(1e-9, math.abs(a)) }
      .sum / n * 100.0
    val mean = actual.sum / n
    val ssTot = actual.map(a => (a - mean) * (a - mean)).sum
    val ssRes = pred.zip(actual).map { case (p, a) => (p - a) * (p - a) }.sum
    val r2 = if (ssTot < 1e-12) (if (ssRes < 1e-12) 1.0 else 0.0) else 1.0 - ssRes / ssTot
    RegMetrics(mae, mape, r2)
  }

  /** A fitted single-target regressor. */
  trait Fitted extends Serializable { def predict(features: Array[Double]): Double }

  /** A trainable model family. */
  trait Model { def name: String; def fit(xs: Seq[Array[Double]], ys: Seq[Double]): Fitted }

  /** Naive baseline: always predict the training mean. */
  object Averaging extends Model {
    val name = "Averaging"
    def fit(xs: Seq[Array[Double]], ys: Seq[Double]): Fitted = {
      val mean = ys.sum / ys.length
      (_: Array[Double]) => mean
    }
  }

  private def toDF(spark: SparkSession, xs: Seq[Array[Double]], ys: Seq[Double]): DataFrame = {
    import spark.implicits._
    xs.zip(ys).map { case (x, y) => (Vectors.dense(x), y) }.toDF("features", "label")
  }

  /** MLlib-backed model; the fitted transformer is applied row-at-a-time via
    * a one-row DataFrame-free local predict (MLlib regressors expose
    * `predict(Vector)` on their models).
    */
  final class SparkModel(val name: String,
                         make: () => org.apache.spark.ml.Predictor[
                           org.apache.spark.ml.linalg.Vector, _, _]) extends Model {
    def fit(xs: Seq[Array[Double]], ys: Seq[Double]): Fitted = {
      val spark = SparkSession.active
      val df    = toDF(spark, xs, ys)
      val model = make().fit(df)
      val m = model.asInstanceOf[org.apache.spark.ml.regression.RegressionModel[
        org.apache.spark.ml.linalg.Vector, _]]
      (f: Array[Double]) => m.predict(Vectors.dense(f))
    }
  }

  def randomForest(seed: Long = 7): Model = new SparkModel("Random Forest",
    () => new RandomForestRegressor().setNumTrees(60).setMaxDepth(8).setSeed(seed))
  def gbt(seed: Long = 7): Model = new SparkModel("XGBoost*", // GBTRegressor stand-in
    () => new GBTRegressor().setMaxIter(40).setMaxDepth(5).setSeed(seed))
  def linear(): Model = new SparkModel("SVR*", // LinearRegression stand-in (L2)
    () => new LinearRegression().setRegParam(0.1).setElasticNetParam(0.0))

  /** The Table VI model zoo. */
  def allModels(seed: Long = 7): Vector[Model] =
    Vector(Averaging, gbt(seed), linear(), randomForest(seed))

  /** Builds labelled examples from samples for one (layout, codec):
    * features per `featureKind` ("entropy" = weighted entropy + size,
    * "size" = size-only, "bucketed" = bucketed entropy + size), targets
    * measured with the real codec.
    */
  def buildExamples(samples: Seq[Sampling.Sample], layout: Layout, codec: Codec,
                    featureKind: String = "entropy"): Vector[Example] =
    samples.iterator.map { s =>
      val raw  = layout.serialize(s.rows)
      val meas = CompressionMeasure.measureBytes(raw, codec)
      val feats = featureKind match {
        case "size" => Features.sizeOnlyVector(raw.length.toLong, s.rows.length.toLong)
        case "bucketed" =>
          Features.featureVector(raw.length.toLong, s.rows.length.toLong,
            Features.bucketedWeightedEntropyLocal(s.rows, s.schema))
        case _ =>
          Features.featureVector(raw.length.toLong, s.rows.length.toLong,
            Features.weightedEntropyLocal(s.rows, s.schema))
      }
      Example(s.tag, feats, meas.ratio, meas.decompSecPerGB)
    }.toVector

  /** Fit on an explicit training set, compute metrics on an explicit test
    * set — used when train and test distributions deliberately differ
    * (Table V's random-samples-vs-queried-data contrast).
    */
  def fitEval(train: Seq[Example], test: Seq[Example], target: Example => Double,
              model: Model): (Fitted, RegMetrics) = {
    require(train.size >= 2 && test.nonEmpty, s"need data: train=${train.size} test=${test.size}")
    val fitted = model.fit(train.map(_.features), train.map(target))
    (fitted, metrics(test.map(e => fitted.predict(e.features)), test.map(target)))
  }

  /** Deterministic train/test split, fit on train, metrics on test.
    * Returns (fitted, testMetrics).
    */
  def trainEval(examples: Seq[Example], target: Example => Double, model: Model,
                trainFrac: Double = 0.7, seed: Long = 11): (Fitted, RegMetrics) = {
    require(examples.size >= 5, s"need >=5 examples, got ${examples.size}")
    val rng      = new scala.util.Random(seed)
    val shuffled = rng.shuffle(examples.toVector)
    val nTrain   = math.max(2, (shuffled.size * trainFrac).toInt)
    val (tr, te) = shuffled.splitAt(nTrain)
    fitEval(tr, te, target, model)
  }

  /** A full per-codec predictor for the SCOPe pipeline: given a partition
    * sample, predict CodecPerf for each compressing codec (identity is
    * prepended with its exact R=1, D=0 values).
    */
  final class PerfPredictor(fittedRatio: Map[String, Fitted], fittedDecomp: Map[String, Fitted],
                            layout: Layout) extends Serializable {
    def predict(rows: IndexedSeq[org.apache.spark.sql.Row],
                schema: org.apache.spark.sql.types.StructType): Vector[CodecPerf] = {
      val raw = layout.serialize(rows)
      val f = Features.featureVector(raw.length.toLong, rows.length.toLong,
        Features.weightedEntropyLocal(rows, schema))
      CodecPerf.identity +: Codecs.compressing.map { c =>
        CodecPerf(math.max(1.0, fittedRatio(c.name).predict(f)),
                  math.max(0.0, fittedDecomp(c.name).predict(f)))
      }
    }
  }

  /** Trains a [[PerfPredictor]] over all compressing codecs for one layout. */
  def trainPredictor(samples: Seq[Sampling.Sample], layout: Layout,
                     model: Model = randomForest()): PerfPredictor = {
    val ratio  = scala.collection.mutable.Map.empty[String, Fitted]
    val decomp = scala.collection.mutable.Map.empty[String, Fitted]
    for (c <- Codecs.compressing) {
      val ex = buildExamples(samples, layout, c)
      ratio(c.name)  = model.fit(ex.map(_.features), ex.map(_.ratio))
      decomp(c.name) = model.fit(ex.map(_.features), ex.map(_.decompSecPerGB))
    }
    new PerfPredictor(ratio.toMap, decomp.toMap, layout)
  }
}
