package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.Scope
import repro.partition.GPartConfig

/** Harnesses for the full-pipeline experiments (Tables IX–XI): build a
  * lake, run all 11 policy variants, and format the paper-style rows.
  * All costs are over a 5.5-month horizon with Azure Premium/Hot/Cool
  * parameters, as in the paper.
  */
object ExpPipeline {

  val Months = 5.5

  /** Configuration of one pipeline experiment. */
  final case class Config(name: String, filesPerBigTable: Int, familiesPerTable: Int,
                          zipfAlpha: Double, freqScale: Double, targetGB: Double,
                          sampleCap: Int, seed: Long)

  /** Table IX: "Enterprise Data II" — 3 tables, ~1.5 GB total, Zipf-like
    * (power-law) query workload, exactly the paper's setup for that data.
    */
  val enterpriseII: Config =
    Config("Enterprise Data II", filesPerBigTable = 24, familiesPerTable = 12,
      zipfAlpha = 1.0, freqScale = 10.0, targetGB = 1.5, sampleCap = 2000, seed = 301)

  /** Table X: TPC-H 100 GB — 8 tables, uniform workload. */
  val tpch100: Config =
    Config("TPC-H 100GB", filesPerBigTable = 40, familiesPerTable = 20,
      zipfAlpha = 0.0, freqScale = 40.0, targetGB = 100.0, sampleCap = 2000, seed = 302)

  /** Table XI: TPC-H 1 TB — same lake, 10x the volume, richer workload. */
  val tpch1t: Config =
    Config("TPC-H 1TB", filesPerBigTable = 40, familiesPerTable = 30,
      zipfAlpha = 0.0, freqScale = 40.0, targetGB = 1000.0, sampleCap = 2000, seed = 303)

  /** Builds the lake for a config. Enterprise II uses the 3-table subset;
    * the TPC-H configs use all 8 tables. `sf` controls the physical rows
    * generated (tests: 0.01, bench: 0.1); costs are scaled to `targetGB`.
    */
  def buildLake(spark: SparkSession, cfg: Config, sf: Double): Scope.DataLake = {
    val specs =
      if (cfg.name == "Enterprise Data II")
        // Three size-balanced tables (~1.5 GB total after scaling), like the
        // paper's three-table enterprise set.
        Vector(
          Scope.TableSpec("orders", repro.SynthData.orders(spark, sf), "o_orderkey",
            cfg.filesPerBigTable),
          Scope.TableSpec("customer", repro.SynthData.customer(spark, sf * 10), "c_custkey",
            cfg.filesPerBigTable),
          Scope.TableSpec("part", repro.SynthData.part(spark, sf * 6), "p_partkey",
            cfg.filesPerBigTable),
        )
      else
        repro.SynthDataExt.allTables(spark, sf).map { case (name, df, sortCol) =>
          val nFiles = name match {
            case "lineitem" | "partsupp" => cfg.filesPerBigTable
            case "nation" | "region"     => 1
            case _                       => math.max(2, cfg.filesPerBigTable / 2)
          }
          Scope.TableSpec(name, df, sortCol, nFiles)
        }
    Scope.buildLake(specs)
  }

  /** Runs all 11 policy variants for one config. */
  def run(spark: SparkSession, cfg: Config, sf: Double): Vector[Scope.PolicyReport] = {
    val lake = buildLake(spark, cfg, sf)
    val measuredGB = lake.catalog.bytes.sum / 1e9
    val bytesScale = cfg.targetGB / measuredGB
    val totalRows  = lake.catalog.rows.sum
    val gpart = GPartConfig(rhoC = 3.0, rhoCAbs = 50.0 * cfg.freqScale,
      sThreshRows = math.max(1L, totalRows / 12))
    Scope.runAll(lake, cfg.familiesPerTable, cfg.zipfAlpha, cfg.freqScale,
      bytesScale, Months, gpart, cfg.sampleCap, cfg.seed)
  }

  /** Paper-style formatted table. */
  def format(cfgName: String, reports: Seq[Scope.PolicyReport]): String = {
    val tierOrder = Seq("Premium", "Hot", "Cool")
    val header = f"${"Variant"}%-36s ${"Adapts"}%-20s ${"Storage"}%10s ${"Decomp"}%8s " +
      f"${"Read"}%10s ${"Total"}%10s ${"TTFB(s)"}%8s ${"Dec(ms)"}%9s  Scheme"
    val lines = reports.map { r =>
      f"${r.label}%-36s ${r.adapts}%-20s ${r.storageCost}%10.1f ${r.decompCost}%8.2f " +
        f"${r.readCost}%10.1f ${r.totalCost}%10.1f ${r.readLatencySec}%8.3f " +
        f"${r.decompLatencyMs}%9.3f  ${r.scheme(tierOrder)}"
    }
    (s"== $cfgName (costs in cents over $Months months) ==" +: header +: lines).mkString("\n")
  }
}
