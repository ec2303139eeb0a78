package repro.compress

import org.apache.spark.sql.{DataFrame, Row}

/** Measured compression performance of one (sample, layout, codec):
  * ground truth for COMPREDICT training and for the "ground truth
  * compression" pipeline runs (footnote 9 of the paper).
  *
  * @param rawBytes        serialized size before compression
  * @param compressedBytes size after compression
  * @param decompSecPerGB  wall-clock decompression seconds normalized per GB
  *                        of raw data
  */
final case class CompMeasurement(rawBytes: Long, compressedBytes: Long, decompSecPerGB: Double) {
  def ratio: Double = rawBytes.toDouble / math.max(1L, compressedBytes)
}

object CompressionMeasure {

  /** Measures one in-memory sample. Decompression is repeated `reps` times
    * and the minimum is taken, which suppresses JIT/GC noise in the
    * sec-per-GB normalization.
    */
  def measureRows(rows: Seq[Row], layout: Layout, codec: Codec, reps: Int = 3): CompMeasurement = {
    val raw = layout.serialize(rows)
    measureBytes(raw, codec, reps)
  }

  /** Measures a pre-serialized buffer. */
  def measureBytes(raw: Array[Byte], codec: Codec, reps: Int = 3): CompMeasurement = {
    val compressed = codec.compress(raw)
    // Warm once so the first timed rep is not a cold path.
    var sink = codec.decompress(compressed, raw.length).length
    var best = Long.MaxValue
    var i = 0
    while (i < reps) {
      val t0 = System.nanoTime()
      sink ^= codec.decompress(compressed, raw.length).length
      val dt = System.nanoTime() - t0
      if (dt < best) best = dt
      i += 1
    }
    require(sink >= 0 || sink < 0) // keep `sink` live so the JIT cannot elide the work
    val secPerGB =
      if (codec == Codecs.Identity) 0.0
      else best / 1e9 / (raw.length.toDouble / (1L << 30))
    CompMeasurement(raw.length.toLong, compressed.length.toLong, secPerGB)
  }

  /** Distributed measurement of a whole DataFrame: each Spark partition is
    * serialized + compressed on the executors; byte totals are summed and
    * the decompression rate is the byte-weighted mean over chunks. This is
    * the "cost model evaluated per partition" path of the reproduction —
    * the work runs inside mapPartitions, not on the driver.
    */
  def measureDF(df: DataFrame, layout: Layout, codec: Codec): CompMeasurement = {
    val perChunk = df.rdd
      .mapPartitions { it =>
        val rows = it.toVector
        if (rows.isEmpty) Iterator.empty
        else Iterator.single(measureRows(rows, layout, codec, reps = 1))
      }
      .collect()
    aggregate(perChunk.toIndexedSeq)
  }

  /** Byte-weighted aggregation of chunk measurements. */
  def aggregate(ms: Seq[CompMeasurement]): CompMeasurement = {
    require(ms.nonEmpty, "no chunks to aggregate")
    val raw  = ms.map(_.rawBytes).sum
    val comp = ms.map(_.compressedBytes).sum
    val sec  = ms.map(m => m.decompSecPerGB * m.rawBytes).sum / math.max(1L, raw)
    CompMeasurement(raw, comp, sec)
  }
}
