package repro.compress

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** COMPREDICT features (Section V): per-datatype *weighted entropy*
  *
  *   H(P, d) = - sum_{s in P[:,d]} len(s) * pr(s) * log pr(s)
  *
  * where the sum ranges over distinct string representations s of values in
  * the columns of datatype d, pr(s) is s's probability of occurrence among
  * those values and len(s) its length. Plus the naive size features the
  * paper compares against.
  */
object Features {

  /** Canonical datatype buckets so feature vectors align across samples. */
  val dtypeUniverse: Vector[String] = Vector("int", "float", "object", "date")

  def dtypeOf(dt: DataType): String = dt match {
    case _: IntegerType | _: LongType | _: ShortType | _: ByteType => "int"
    case _: DoubleType | _: FloatType | _: DecimalType             => "float"
    case _: DateType | _: TimestampType                            => "date"
    case _                                                         => "object"
  }

  /** Weighted entropy per datatype bucket, computed locally on collected
    * rows (samples are small by construction).
    */
  def weightedEntropyLocal(rows: Seq[Row], schema: StructType): Map[String, Double] = {
    val byType = schema.fields.zipWithIndex.groupBy { case (f, _) => dtypeOf(f.dataType) }
    byType.map { case (d, fields) =>
      val counts = new scala.collection.mutable.HashMap[String, Long]
      var total  = 0L
      rows.foreach { r =>
        fields.foreach { case (_, i) =>
          val s = Option(r.get(i)).map(_.toString).getOrElse("")
          counts.update(s, counts.getOrElse(s, 0L) + 1L)
          total += 1L
        }
      }
      val h =
        if (total == 0) 0.0
        else counts.iterator.map { case (s, c) =>
          val pr = c.toDouble / total
          -s.length * pr * math.log(pr)
        }.sum
      d -> h
    }
  }

  /** Distributed weighted entropy over a full DataFrame (the one-time full
    * scan the paper mentions): per column, a groupBy-count aggregation
    * computes pr(s); per-datatype sums pool columns of the same bucket.
    */
  def weightedEntropyDF(df: DataFrame): Map[String, Double] = {
    val fields = df.schema.fields
    // One pass per datatype bucket: stack the bucket's columns into one
    // value column, then aggregate -len*pr*log(pr) over the value counts.
    fields.groupBy(f => dtypeOf(f.dataType)).map { case (d, fs) =>
      val stacked = fs.toSeq.map(f => df.select(col(f.name).cast(StringType) as "v"))
        .reduce(_ unionAll _)
      val counts = stacked.na.fill("", Seq("v")).groupBy("v").count()
      val total  = counts.agg(sum("count")).first().getLong(0).toDouble
      val h = counts
        .select(sum(-length(col("v")) * (col("count") / total) * log(col("count") / total)) as "h")
        .first()
      d -> (if (h.isNullAt(0)) 0.0 else h.getDouble(0))
    }
  }

  /** Bucketed weighted entropy (the sorting-sensitivity variant): entropy of
    * each successive `buckets`-th of the rows, per datatype, averaged.
    */
  def bucketedWeightedEntropyLocal(rows: Seq[Row], schema: StructType,
                                   buckets: Int = 5): Map[String, Double] = {
    if (rows.isEmpty) return dtypeUniverse.map(_ -> 0.0).toMap
    val size = math.max(1, math.ceil(rows.size.toDouble / buckets).toInt)
    val per  = rows.grouped(size).map(chunk => weightedEntropyLocal(chunk, schema)).toVector
    dtypeUniverse.map { d =>
      d -> per.map(_.getOrElse(d, 0.0)).sum / per.size
    }.toMap
  }

  /** Assembles the model feature vector for one sample: raw serialized size,
    * row count, and the per-datatype weighted entropies aligned to
    * [[dtypeUniverse]].
    */
  def featureVector(rawBytes: Long, nRows: Long, entropy: Map[String, Double]): Array[Double] =
    Array(rawBytes.toDouble, nRows.toDouble) ++
      dtypeUniverse.map(d => entropy.getOrElse(d, 0.0))

  /** The paper's "Size"-only baseline features. */
  def sizeOnlyVector(rawBytes: Long, nRows: Long): Array[Double] =
    Array(rawBytes.toDouble, nRows.toDouble)
}
