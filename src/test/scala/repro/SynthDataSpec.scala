package repro

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite

class SynthDataSpec extends AnyFunSuite with SparkSpec {

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.002).collect().toSeq
    val b = SynthData.orders(spark, 0.002).collect().toSeq
    assert(a == b)
  }

  test("row counts scale with sf") {
    assert(SynthData.lineitem(spark, 0.002).count() == 12000L)
    assert(SynthData.orders(spark, 0.002).count() == 3000L)
    assert(SynthDataExt.partsupp(spark, 0.002).count() == 1600L)
    assert(SynthDataExt.supplier(spark, 0.002).count() == 20L)
  }

  test("nation and region are the fixed TPC-H dimension tables") {
    assert(SynthDataExt.nation(spark).count() == 25)
    assert(SynthDataExt.region(spark).count() == 5)
  }

  test("allTables exposes the 8-table TPC-H schema with valid sort columns") {
    val ts = SynthDataExt.allTables(spark, 0.002)
    assert(ts.map(_._1) ==
      Vector("lineitem", "orders", "customer", "part", "supplier", "partsupp", "nation", "region"))
    ts.foreach { case (name, df, sortCol) =>
      assert(df.columns.contains(sortCol), s"$name missing $sortCol")
    }
  }

  test("skewed lineitem concentrates keys: top orderkey share far exceeds uniform") {
    val skew = SynthDataExt.lineitemSkew(spark, 0.002, alpha = 1.2)
    val uni  = SynthData.lineitem(spark, 0.002)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val total = df.count().toDouble
      df.groupBy("l_orderkey").count().orderBy(desc("count")).limit(1)
        .collect().head.getLong(1) / total
    }
    assert(topShare(skew) > 10 * topShare(uni))
  }

  test("skewed lineitem keeps the lineitem schema") {
    assert(SynthDataExt.lineitemSkew(spark, 0.002).columns.toSeq ==
      SynthData.lineitem(spark, 0.002).columns.toSeq)
  }

  test("orders aggregation agrees with DuckDB (oracle sanity for the provided generators)") {
    val orders = SynthData.orders(spark, 0.002)
    val agg = orders.groupBy("o_orderstatus")
      .agg(count(lit(1)) as "cnt", round(sum("o_totalprice"), 2) as "total")
    Oracle.assertEquivalent(agg,
      "SELECT o_orderstatus, count(*) AS cnt, round(sum(o_totalprice::DOUBLE), 2) AS total " +
        "FROM orders GROUP BY o_orderstatus", "orders" -> orders)
  }
}
