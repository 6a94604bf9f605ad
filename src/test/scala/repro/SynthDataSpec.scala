package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators, cross-checked with the DuckDB oracle
  * on aggregation queries (result equality, not just "it ran").
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem: returnflag/linestatus aggregation matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val agg = li.groupBy("l_returnflag", "l_linestatus")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("sum_qty"))
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag, l_linestatus, count(*) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag, l_linestatus""".stripMargin,
      "lineitem" -> li,
    )
  }

  test("orders: status histogram matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val agg = o.groupBy("o_orderstatus").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      agg,
      "SELECT o_orderstatus, count(*) AS cnt FROM orders GROUP BY o_orderstatus",
      "orders" -> o,
    )
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, sf = 0.001).agg(sum("c_acctbal")).head().getDouble(0)
    val b = SynthData.customer(spark, sf = 0.001).agg(sum("c_acctbal")).head().getDouble(0)
    assert(a == b)
  }

  test("zipf keys are skewed toward low ranks; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000).cache()
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000).cache()
    val zTop = z.filter("k <= 10").count().toDouble / 20000
    val uTop = u.filter("k <= 10").count().toDouble / 20000
    assert(zTop > 0.3, s"zipf top-10 share $zTop")
    assert(uTop < 0.05, s"uniform top-10 share $uTop")
  }
}
