package repro.compress

import org.apache.spark.sql.{Column, DataFrame, Row}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import scala.util.Random

/** Training-sample generation for COMPREDICT (Section V): random row
  * samples vs query-result samples. The paper's key observation (Fig. 4)
  * is that queried data has more repetition than random row samples, so
  * models trained on query results predict compression on real access
  * patterns far better.
  */
object Sampling {

  /** One training sample: collected rows plus a provenance tag. */
  final case class Sample(tag: String, rows: IndexedSeq[Row], schema: StructType)

  /** `n` random-row samples of ~`rowsPer` rows each. */
  def randomSamples(df: DataFrame, n: Int, rowsPer: Int, seed: Long): Vector[Sample] = {
    val total = df.count().toDouble
    (0 until n).map { i =>
      val frac = math.min(1.0, rowsPer / math.max(1.0, total) * 1.3)
      val rows = df.sample(withReplacement = false, frac, seed + i)
        .limit(rowsPer).collect().toIndexedSeq
      Sample(s"random-$i", rows, df.schema)
    }.toVector.filter(_.rows.nonEmpty)
  }

  /** A synthetic query: equality on a categorical column or a range on a
    * numeric/date column — the template classes TPC-H predicates reduce to.
    */
  sealed trait QuerySpec { def predicate: Column; def tag: String }
  final case class EqQuery(col0: String, value: String) extends QuerySpec {
    def predicate: Column = col(col0).cast(StringType) === value
    def tag: String       = s"eq:$col0=$value"
  }
  final case class RangeQuery(col0: String, lo: Double, hi: Double) extends QuerySpec {
    def predicate: Column = col(col0) >= lo && col(col0) < hi
    def tag: String       = s"range:$col0[$lo,$hi)"
  }

  /** Generates `n` query specs from the DataFrame's schema: equality
    * predicates over observed categorical values, range predicates over
    * numeric quantiles (range width varies so result sizes vary, as 20
    * instances per TPC-H template would).
    */
  def generateQueries(df: DataFrame, n: Int, seed: Long): Vector[QuerySpec] = {
    val rng = new Random(seed)
    val catCols = df.schema.fields.filter(f => Features.dtypeOf(f.dataType) == "object").map(_.name)
    val numCols = df.schema.fields
      .filter(f => Set("int", "float").contains(Features.dtypeOf(f.dataType))).map(_.name)

    val catValues: Map[String, IndexedSeq[String]] = catCols.map { c =>
      c -> df.select(col(c).cast(StringType)).distinct().limit(50)
        .collect().map(_.getString(0)).toIndexedSeq
    }.toMap
    val numBounds: Map[String, (Double, Double)] = numCols.map { c =>
      val r = df.agg(min(col(c).cast(DoubleType)), max(col(c).cast(DoubleType))).first()
      c -> (r.getDouble(0), r.getDouble(1))
    }.toMap

    (0 until n).map { _ =>
      if (catCols.nonEmpty && (numCols.isEmpty || rng.nextDouble() < 0.4)) {
        val c  = catCols(rng.nextInt(catCols.length))
        val vs = catValues(c)
        EqQuery(c, vs(rng.nextInt(vs.length)))
      } else {
        val c          = numCols(rng.nextInt(numCols.length))
        val (lo, hi)   = numBounds(c)
        val width      = (hi - lo) * (0.02 + rng.nextDouble() * 0.3)
        val start      = lo + rng.nextDouble() * math.max(1e-9, hi - lo - width)
        RangeQuery(c, start, start + width)
      }
    }.toVector
  }

  /** Executes queries and returns their (capped) result sets as samples. */
  def querySamples(df: DataFrame, queries: Seq[QuerySpec], maxRows: Int): Vector[Sample] =
    queries.iterator.map { q =>
      Sample(q.tag, df.filter(q.predicate).limit(maxRows).collect().toIndexedSeq, df.schema)
    }.filter(_.rows.nonEmpty).toVector
}
