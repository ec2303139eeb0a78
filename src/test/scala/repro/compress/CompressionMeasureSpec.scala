package repro.compress

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

class CompressionMeasureSpec extends AnyFunSuite with SparkSpec {

  test("measureBytes: ratio = raw / compressed, positive decompression rate") {
    val raw = ("repetition! " * 2000).getBytes
    val m = CompressionMeasure.measureBytes(raw, Codecs.Gzip)
    assert(m.rawBytes == raw.length)
    assert(m.compressedBytes < m.rawBytes)
    assert(math.abs(m.ratio - raw.length.toDouble / m.compressedBytes) < 1e-9)
    assert(m.decompSecPerGB > 0)
  }

  test("identity codec: ratio 1, decompression time 0") {
    val m = CompressionMeasure.measureBytes("abcdef".getBytes, Codecs.Identity)
    assert(m.ratio == 1.0)
    assert(m.decompSecPerGB == 0.0)
  }

  test("snappy decompresses faster than gzip per GB (the latency tradeoff COMPREDICT learns)") {
    val raw = ("enterprise data lake partition content " * 30000).getBytes
    val g = CompressionMeasure.measureBytes(raw, Codecs.Gzip, reps = 5)
    val s = CompressionMeasure.measureBytes(raw, Codecs.SnappyCodec, reps = 5)
    assert(s.decompSecPerGB < g.decompSecPerGB)
  }

  test("aggregate is byte-weighted") {
    val a = CompMeasurement(100, 50, 2.0)
    val b = CompMeasurement(300, 100, 4.0)
    val agg = CompressionMeasure.aggregate(Seq(a, b))
    assert(agg.rawBytes == 400 && agg.compressedBytes == 150)
    assert(math.abs(agg.decompSecPerGB - (2.0 * 100 + 4.0 * 300) / 400) < 1e-9)
  }

  test("aggregate of nothing is rejected") {
    assertThrows[IllegalArgumentException] { CompressionMeasure.aggregate(Nil) }
  }

  test("measureDF (distributed) agrees with a local measurement on the same rows") {
    import spark.implicits._
    val df = (1 to 5000).map(i => (i.toLong, s"cat-${i % 7}", i * 1.5)).toDF("k", "c", "v")
      .repartition(4).cache()
    val dist = CompressionMeasure.measureDF(df, Layouts.RowCsv, Codecs.Gzip)
    val local = CompressionMeasure.measureRows(df.collect().toVector, Layouts.RowCsv, Codecs.Gzip)
    assert(dist.rawBytes == local.rawBytes, "serialized bytes must match exactly")
    // Per-chunk compression loses a little context vs one big buffer.
    assert(math.abs(dist.ratio - local.ratio) / local.ratio < 0.25)
    df.unpersist()
  }

  test("measureRows on an empty partition set yields empty serialization") {
    val m = CompressionMeasure.measureRows(Vector.empty, Layouts.RowCsv, Codecs.SnappyCodec)
    assert(m.rawBytes == 0L)
  }
}
