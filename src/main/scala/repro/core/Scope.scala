package repro.core

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.StructType
import repro.compress._
import repro.partition._

/** SCOPe (Section VII): the unified pipeline
  *   query logs -> initial partitions -> G-PART merge -> COMPREDICT (or
  *   ground-truth compression) -> OPTASSIGN -> tier + codec assignment,
  * plus the policy variants of Tables IX–XI (Default / Ares / Hermes /
  * HCompress adaptations, with and without G-PART).
  */
object Scope {

  /** One lake table to be range-split into files on `sortCol`. */
  final case class TableSpec(name: String, df: DataFrame, sortCol: String, nFiles: Int)

  /** A table after file splitting: `df` carries a global `file_id` column. */
  final case class LakeTable(name: String, df: DataFrame, schema: StructType,
                             fileOffset: Int, nFiles: Int)

  /** The whole lake: tables plus the global file catalog (rows and raw
    * CSV-serialized bytes per file, both computed with DataFrame
    * aggregations on the executors).
    */
  final case class DataLake(tables: Vector[LakeTable], catalog: FileCatalog) {
    def tableOfFile(fileId: Int): LakeTable =
      tables.find(t => fileId >= t.fileOffset && fileId < t.fileOffset + t.nFiles)
        .getOrElse(throw new IllegalArgumentException(s"no table owns file $fileId"))

    /** Collects up to `cap` rows of a partition (all of whose files belong
      * to one table, since query families never span tables).
      */
    def sampleRows(part: Part, cap: Int): (IndexedSeq[Row], StructType) = {
      val t = tableOfFile(part.files.head)
      val rows = t.df
        .filter(col("file_id").isin(part.files.toSeq.map(Integer.valueOf): _*))
        .drop("file_id")
        .limit(cap)
        .collect()
        .toIndexedSeq
      (rows, StructType(t.schema.filterNot(_.name == "file_id")))
    }
  }

  /** Splits every table into contiguous files along its sort column and
    * computes the global file catalog. Row byte sizes are the CSV
    * serialization lengths, aggregated per file in Catalyst (this is the
    * distributed "cost model evaluated per partition" path).
    */
  def buildLake(specs: Seq[TableSpec]): DataLake = {
    var offset = 0
    val tables = specs.map { s =>
      val w = Window.orderBy(col(s.sortCol), monotonically_increasing_id())
      val df = s.df
        .withColumn("file_id", ((ntile(s.nFiles).over(w) - 1) + offset).cast("int"))
        .cache()
      df.count() // materialize before the window's single-partition shuffle is re-run
      val t = LakeTable(s.name, df, df.schema, offset, s.nFiles)
      offset += s.nFiles
      t
    }.toVector

    val stats = tables.map { t =>
      val dataCols = t.df.columns.filterNot(_ == "file_id").map(c => col(c).cast("string"))
      t.df
        .groupBy(col("file_id"))
        .agg(count(lit(1)) as "rows",
             sum(length(concat_ws(",", dataCols: _*)) + 1) as "bytes")
        .collect()
        .map(r => (r.getInt(0), r.getLong(1), r.getLong(2)))
    }
    val all   = stats.flatten.sortBy(_._1)
    val rows  = all.map(_._2).toVector
    val bytes = all.map(_._3).toVector
    DataLake(tables, FileCatalog(rows, bytes))
  }

  /** Generates Zipf/uniform query families per table (contiguous file
    * ranges) with globally unique partition ids; returned in file order.
    *
    * @param freqScale multiplies the base family frequency — calibrates how
    *                  much read traffic the billing period sees
    */
  def initialPartitions(lake: DataLake, familiesPerTable: Int, zipfAlpha: Double,
                        freqScale: Double, seed: Long): Vector[Part] = {
    var nextId = 0
    lake.tables.flatMap { t =>
      val local = QueryWorkload.rangeFamilies(
        t.nFiles, familiesPerTable, maxSpanFiles = math.max(1, t.nFiles / 8),
        zipfAlpha, seed + t.fileOffset)
      local.map { p =>
        val shifted = p.files.map(_ + t.fileOffset)
        val part = Part.initial(nextId, shifted, p.rho * freqScale)
        nextId += 1
        part
      }
    }
  }

  /** Whole-table partitions for the non-partitioned policy rows: each table
    * is one partition whose rho is the sum of its families' frequencies
    * (every query scans the whole table when there is no partitioning).
    */
  def wholeTableParts(lake: DataLake, initial: Seq[Part]): Vector[Part] =
    lake.tables.zipWithIndex.map { case (t, i) =>
      val fileRange = t.fileOffset until (t.fileOffset + t.nFiles)
      val rho = initial.filter(p => p.files.head >= t.fileOffset &&
        p.files.head < t.fileOffset + t.nFiles).map(_.rho).sum
      Part.initial(100000 + i, fileRange, rho)
    }

  /** Ground-truth compression performance of a partition: measured with the
    * real codecs on a row sample in the given layout (identity prepended).
    */
  def groundTruthPerf(lake: DataLake, part: Part, layout: Layout, cap: Int): Vector[CodecPerf] = {
    val (rows, _) = lake.sampleRows(part, cap)
    CodecPerf.identity +: Codecs.compressing.map { c =>
      val m = CompressionMeasure.measureRows(rows, layout, c)
      CodecPerf(m.ratio, m.decompSecPerGB)
    }
  }

  // ---------------------------------------------------------------------
  // Policy variants (rows of Tables IX–XI)
  // ---------------------------------------------------------------------

  /** @param partitioned  G-PART partitions (true) or whole tables (false)
    * @param tiers        tier menu offered to OPTASSIGN
    * @param compression  offer the compressing codecs (true) or identity only
    * @param capacityFracs per-tier stored-capacity as a fraction of the raw
    *                     total; None = unbounded
    * @param weights      OPTASSIGN objective weights
    * @param latencyLex   HCompress-style: lexicographically minimize
    *                     (TTFB + decompression time), cost as tiebreak
    */
  final case class Variant(key: String, label: String, adapts: String,
                           partitioned: Boolean, tiers: Vector[Tier], compression: Boolean,
                           capacityFracs: Option[Vector[Double]], weights: CostWeights,
                           latencyLex: Boolean)

  /** Capacity reservations as fractions of the raw volume. The paper's
    * Table XII reservations are only mildly binding (its Hermes rows keep
    * the big tables on Premium, and "SCOPe (No capacity constraint)" barely
    * differs from "Total cost focused"), so Premium holds half the lake and
    * Hot three quarters; the last online tier absorbs the rest.
    */
  val capFracs: Vector[Double] = Vector(0.9, 0.9, Double.PositiveInfinity)

  /** The 11 policy rows of Tables IX–XI, in paper order. */
  def variants: Vector[Variant] = {
    val p3 = CostModel.azure3
    val premiumOnly = Vector(CostModel.Premium)
    Vector(
      Variant("default", "Default (store on premium)", "-",
        partitioned = false, premiumOnly, compression = false, None, CostWeights(), latencyLex = false),
      Variant("ares", "Compress & store on premium", "Ares",
        partitioned = false, premiumOnly, compression = true, None, CostWeights(), latencyLex = false),
      Variant("hermes", "Multi-Tiering", "Hermes",
        partitioned = false, p3, compression = false, Some(capFracs), CostWeights(), latencyLex = false),
      Variant("hcompress", "Latency time focused", "HCompress",
        partitioned = false, p3, compression = true, Some(capFracs), CostWeights(), latencyLex = true),
      Variant("part-premium", "Partition & store on premium", "-",
        partitioned = true, premiumOnly, compression = false, None, CostWeights(), latencyLex = false),
      Variant("part-tier", "Partitioning + Tiering", "Hermes + G-PART",
        partitioned = true, p3, compression = false, Some(capFracs), CostWeights(), latencyLex = false),
      Variant("part-compress", "Partitioning + Compression", "Ares + G-PART",
        partitioned = true, premiumOnly, compression = true, None, CostWeights(), latencyLex = false),
      Variant("scope-latency", "SCOPe (Latency time focused)", "HCompress + G-PART",
        partitioned = true, p3, compression = true, Some(capFracs), CostWeights(), latencyLex = true),
      Variant("scope-nocap", "SCOPe (No capacity constraint)", "-",
        partitioned = true, p3, compression = true, None, CostWeights(), latencyLex = false),
      Variant("scope-read", "SCOPe (Read+Decomp. cost focused)", "-",
        partitioned = true, p3, compression = true, Some(capFracs),
        CostWeights(alpha = 0.1, beta = 1.0, gamma = 0.1), latencyLex = false),
      Variant("scope-total", "SCOPe (Total cost focused)", "-",
        partitioned = true, p3, compression = true, Some(capFracs), CostWeights(), latencyLex = false),
    )
  }

  /** The reported columns of Tables IX–XI for one policy row. All costs are
    * cents at weights (1,1,1) regardless of the optimizer's steering
    * weights; latencies are access-weighted means.
    */
  final case class PolicyReport(label: String, adapts: String,
                                storageCost: Double, decompCost: Double, readCost: Double,
                                readLatencySec: Double, decompLatencyMs: Double,
                                tierCounts: Map[String, Int]) {
    def totalCost: Double = storageCost + decompCost + readCost
    def scheme(tierOrder: Seq[String]): String =
      tierOrder.map(t => tierCounts.getOrElse(t, 0)).mkString("[", ", ", "]")
  }

  /** Prepared per-partition inputs for one policy family: raw GB (scaled),
    * access counts, and per-codec performance.
    */
  final case class PreparedParts(parts: Vector[Part], stats: Vector[PartitionStat])

  /** Builds OPTASSIGN partition stats: sizes from the catalog scaled by
    * `bytesScale` (SF=0.1 measured bytes -> nominal 100 GB / 1 TB volumes),
    * compression perf ground-truth-measured (or identity-only).
    */
  def prepare(lake: DataLake, parts: Vector[Part], bytesScale: Double,
              compression: Boolean, sampleCap: Int): PreparedParts = {
    val stats = parts.map { p =>
      val rawGB = p.spanBytes(lake.catalog) * bytesScale / 1e9
      val perfs =
        if (compression) {
          val measured = groundTruthPerf(lake, p, Layouts.Columnar, sampleCap)
          // decompSecPerGB is measured per raw GB; absolute decompression time
          // for the (scaled) partition follows inside OptAssign.costOf.
          measured
        } else Vector(CodecPerf.identity)
      PartitionStat(p.id, rawGB, p.rho, latencySlaSec = 1e7,
        currentTier = -1, currentCodec = -1, codecPerfs = perfs)
    }
    PreparedParts(parts, stats)
  }

  /** Runs one policy variant and produces its report row. */
  def runVariant(v: Variant, prepared: PreparedParts, months: Double): PolicyReport = {
    val stats = prepared.stats.map { s =>
      if (v.compression) s else s.copy(codecPerfs = Vector(s.codecPerfs.head))
    }
    val totalRawGB = stats.map(_.sizeGB).sum
    val caps = v.capacityFracs match {
      case Some(fr) => fr.map(f => if (f.isInfinity) Double.PositiveInfinity else f * totalRawGB)
      case None     => Vector.fill(v.tiers.length)(Double.PositiveInfinity)
    }
    val inst = OptAssignInstance(stats, v.tiers, caps, v.weights, months)
    val assignment =
      if (v.latencyLex)
        // HCompress adaptation: minimize expected (access-weighted) latency
        // = rho * (decompression time + TTFB), with cost as the tiebreak.
        OptAssign.solveScored(inst, (p, l, k) =>
          math.max(p.accesses, 1.0) *
            (p.codecPerfs(k).decompSecPerGB * p.sizeGB + inst.tiers(l).ttfbSec) * 1e6 +
            OptAssign.costOf(inst, p, l, k))
      else if (stats.length <= 12)
        // Whole-table instances are tiny: solve the ILP exactly (the greedy
        // repair can evict the wrong table when only a small deficit needs
        // freeing).
        try IlpSolver.solveExact(inst)
        catch { case _: IllegalStateException => OptAssign.solve(inst) }
      else OptAssign.solve(inst)
    val chosen = assignment.getOrElse(
      throw new IllegalStateException(s"variant ${v.key} infeasible"))
    report(v, inst, chosen, months)
  }

  /** Cost/latency breakdown at reporting weights (1,1,1). */
  def report(v: Variant, inst: OptAssignInstance, chosen: Seq[Assignment],
             months: Double): PolicyReport = {
    val byId = inst.parts.map(p => p.id -> p).toMap
    var storage, decomp, read = 0.0
    var ttfbW, decompW, rhoSum = 0.0
    val counts = scala.collection.mutable.Map.empty[String, Int]
    for (a <- chosen) {
      val p        = byId(a.id)
      val t        = inst.tiers(a.tier)
      val perf     = p.codecPerfs(a.codec)
      val storedGB = p.sizeGB / perf.ratio
      val decompT  = perf.decompSecPerGB * p.sizeGB
      storage += t.storageCentsPerGBMonth * months * storedGB +
        CostModel.tierChangeCents(inst.tiers, p.currentTier, a.tier, storedGB)
      decomp += p.accesses * CostModel.computeCentsPerSec * decompT
      read   += p.accesses * t.readCentsPerGB * storedGB
      ttfbW   += p.accesses * t.ttfbSec
      decompW += p.accesses * decompT
      rhoSum  += p.accesses
      counts.update(t.name, counts.getOrElse(t.name, 0) + 1)
    }
    PolicyReport(v.label, v.adapts, storage, decomp, read,
      if (rhoSum > 0) ttfbW / rhoSum else 0.0,
      if (rhoSum > 0) decompW / rhoSum * 1000.0 else 0.0,
      counts.toMap)
  }

  /** End-to-end run of all 11 policy rows for one dataset configuration.
    *
    * @param bytesScale  measured-bytes multiplier to reach the nominal volume
    * @param months      billing horizon (paper: 5.5)
    */
  def runAll(lake: DataLake, familiesPerTable: Int, zipfAlpha: Double, freqScale: Double,
             bytesScale: Double, months: Double, gpartCfg: GPartConfig,
             sampleCap: Int = 2000, seed: Long = 101): Vector[PolicyReport] = {
    val initial = initialPartitions(lake, familiesPerTable, zipfAlpha, freqScale, seed)
    val merged  = GPart.merge(initial, lake.catalog, gpartCfg)
    val whole   = wholeTableParts(lake, initial)

    val preparedWholeC  = prepare(lake, whole, bytesScale, compression = true, sampleCap)
    val preparedMergedC = prepare(lake, merged, bytesScale, compression = true, sampleCap)

    variants.map { v =>
      val prepared = if (v.partitioned) preparedMergedC else preparedWholeC
      runVariant(v, prepared, months)
    }
  }
}
