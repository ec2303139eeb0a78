package repro.core

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite
import repro.{Oracle, SparkSpec, SynthData}
import repro.partition.GPartConfig

class ScopeSpec extends AnyFunSuite with SparkSpec {

  private lazy val lake: Scope.DataLake = Scope.buildLake(Seq(
    Scope.TableSpec("orders", SynthData.orders(spark, sf = 0.004), "o_orderkey", 6),
    Scope.TableSpec("customer", SynthData.customer(spark, sf = 0.004), "c_custkey", 4),
  ))

  test("buildLake: catalog covers all files with positive rows and bytes") {
    assert(lake.catalog.nFiles == 10)
    assert(lake.catalog.rows.forall(_ > 0))
    assert(lake.catalog.bytes.forall(_ > 0))
  }

  test("buildLake: per-table file row totals equal table row counts") {
    val ordersRows = SynthData.orders(spark, sf = 0.004).count()
    assert(lake.catalog.rows.take(6).sum == ordersRows)
  }

  test("buildLake: per-file row counts match DuckDB over the file-id assignment (oracle)") {
    val t = lake.tables.head
    val counts = t.df.groupBy(col("file_id")).agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(counts,
      "SELECT file_id, count(*) AS cnt FROM f GROUP BY file_id", "f" -> t.df)
  }

  test("buildLake: catalog bytes equal the CSV serialization length (cross-check vs local)") {
    val t = lake.tables(1) // customer: small
    val rows = t.df.drop("file_id").collect().toVector
    val localBytes = repro.compress.Layouts.RowCsv.serialize(rows).length.toLong
    val catBytes = (t.fileOffset until t.fileOffset + t.nFiles).map(lake.catalog.bytes).sum
    assert(catBytes == localBytes)
  }

  test("tableOfFile maps global file ids to their owning table") {
    assert(lake.tableOfFile(0).name == "orders")
    assert(lake.tableOfFile(5).name == "orders")
    assert(lake.tableOfFile(6).name == "customer")
    assertThrows[IllegalArgumentException] { lake.tableOfFile(99) }
  }

  test("sampleRows returns only rows of the partition's files") {
    val part = repro.partition.Part.initial(0, Seq(6, 7), 1.0) // customer files
    val (rows, schema) = lake.sampleRows(part, cap = 100000)
    assert(schema.fieldNames.toSeq == SynthData.customer(spark, 0.004).columns.toSeq)
    val expected = lake.catalog.rows(6) + lake.catalog.rows(7)
    assert(rows.length == expected)
  }

  test("initialPartitions: per-table families with globally unique ids, scaled frequencies") {
    val parts = Scope.initialPartitions(lake, familiesPerTable = 5, zipfAlpha = 1.0,
      freqScale = 10.0, seed = 1)
    assert(parts.length == 10)
    assert(parts.map(_.id).distinct.length == 10)
    // families never span tables
    parts.foreach { p =>
      val t = lake.tableOfFile(p.files.head)
      assert(p.files.forall(f => lake.tableOfFile(f).name == t.name))
    }
    assert(parts.forall(_.rho >= 10.0)) // freqScale applied (base >= 1)
  }

  test("wholeTableParts: one partition per table, rho = sum of family frequencies") {
    val parts = Scope.initialPartitions(lake, 5, 1.0, 1.0, seed = 2)
    val whole = Scope.wholeTableParts(lake, parts)
    assert(whole.length == 2)
    assert(math.abs(whole.map(_.rho).sum - parts.map(_.rho).sum) < 1e-9)
    assert(whole.head.files.size == 6 && whole(1).files.size == 4)
  }

  test("groundTruthPerf: identity first, compressing codecs achieve ratio > 1") {
    val part = repro.partition.Part.initial(0, Seq(0, 1), 1.0)
    val perfs = Scope.groundTruthPerf(lake, part, repro.compress.Layouts.Columnar, cap = 1500)
    assert(perfs.length == 4)
    assert(perfs.head == CodecPerf.identity)
    assert(perfs.tail.forall(_.ratio > 1.0))
  }

  test("prepare scales partition sizes by bytesScale") {
    val parts = Scope.initialPartitions(lake, 3, 0.0, 1.0, seed = 3)
    val p1 = Scope.prepare(lake, parts, bytesScale = 1.0, compression = false, sampleCap = 100)
    val p2 = Scope.prepare(lake, parts, bytesScale = 10.0, compression = false, sampleCap = 100)
    p1.stats.zip(p2.stats).foreach { case (a, b) =>
      assert(math.abs(b.sizeGB - 10 * a.sizeGB) < 1e-12)
    }
  }

  test("variants: the 11 policy rows of Tables IX-XI in paper order") {
    val keys = Scope.variants.map(_.key)
    assert(keys == Vector("default", "ares", "hermes", "hcompress", "part-premium",
      "part-tier", "part-compress", "scope-latency", "scope-nocap", "scope-read", "scope-total"))
    assert(Scope.variants.count(_.partitioned) == 7)
    assert(Scope.variants.count(_.compression) == 7)
  }

  test("end-to-end runAll: report shape and headline orderings") {
    val reports = Scope.runAll(lake, familiesPerTable = 4, zipfAlpha = 1.0, freqScale = 10.0,
      bytesScale = 100.0, months = 5.5, GPartConfig(rhoC = 3.0, rhoCAbs = 100.0,
        sThreshRows = lake.catalog.rows.sum / 2), sampleCap = 800, seed = 4)
    assert(reports.length == 11)
    val byLabel = reports.map(r => r.label -> r).toMap
    val default = byLabel("Default (store on premium)")
    val ares    = byLabel("Compress & store on premium")
    val partP   = byLabel("Partition & store on premium")
    val scope   = byLabel("SCOPe (Total cost focused)")

    assert(default.decompCost == 0.0 && default.decompLatencyMs == 0.0)
    assert(ares.storageCost < default.storageCost, "compression must cut premium storage")
    assert(partP.readCost < default.readCost, "partitioning must cut read volume")
    assert(scope.totalCost < default.totalCost, "SCOPe must beat the platform default")
    assert(scope.totalCost <= reports.map(_.totalCost).max)
    // tier counts are consistent with the number of partitions
    assert(default.tierCounts.values.sum == 2)
    assert(partP.tierCounts.values.sum > 2, "G-PART yields more partitions than tables")
  }

  test("latency-focused variant achieves the lowest expected access latency") {
    val reports = Scope.runAll(lake, 4, 1.0, 10.0, 100.0, 5.5,
      GPartConfig(3.0, 100.0, lake.catalog.rows.sum / 2), sampleCap = 800, seed = 5)
    val byLabel = reports.map(r => r.label -> r).toMap
    val lat = byLabel("SCOPe (Latency time focused)")
    val tot = byLabel("SCOPe (Total cost focused)")
    // The latency-lex score minimizes rho * (TTFB + decomp), i.e. the
    // access-weighted mean of (readLatencySec + decompLatency).
    def expectedLatency(r: Scope.PolicyReport): Double =
      r.readLatencySec + r.decompLatencyMs / 1000.0
    assert(expectedLatency(lat) <= expectedLatency(tot) + 1e-6)
    assert(lat.decompLatencyMs <= tot.decompLatencyMs + 1e-9,
      "latency focus never compresses more than cost focus")
  }
}
