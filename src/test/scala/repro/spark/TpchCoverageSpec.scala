package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.{InvertedIndex, Pattern}
import repro.core.mup.{DeepDiver, PatternBreaker}

/** End-to-end coverage pipeline over the provided TPC-H-lite generator:
  * continuous attributes bucketized into categories (§II's prescription),
  * coverage counts cross-checked against DuckDB, MUPs identified.
  */
class TpchCoverageSpec extends SparkSpec {

  private lazy val li  = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val cat = CoverageData.fromTpchLineitem(li).cache()
  private val attrs = CoverageData.lineitemAttrs
  private val cards = CoverageData.lineitemCards

  test("bucketized lineitem stays within the declared cardinalities") {
    val data = SparkCoverage.collectCompressed(cat, attrs, cards)
    assert(data.total == li.count())
    assert(data.distinctCombos <= cards.product)
  }

  test("pattern coverage on bucketized lineitem matches DuckDB filters") {
    val data  = SparkCoverage.collectCompressed(cat, attrs, cards)
    val index = new InvertedIndex(data)
    // cov(returnflag=0, X, X, X) and cov(X, 1, qty_bucket=4, X) vs DuckDB
    val checks = Seq(
      Pattern.parse("0XXX") -> "returnflag = '0'",
      Pattern.parse("X14X") -> "linestatus = '1' AND qty_bucket = '4'",
      Pattern.parse("21X2") -> "returnflag = '2' AND linestatus = '1' AND disc_bucket = '2'",
    )
    for ((p, whereClause) <- checks) {
      val sparkCnt = spark.createDataFrame(
        java.util.Arrays.asList(org.apache.spark.sql.Row(index.cov(p))),
        org.apache.spark.sql.types.StructType(Seq(
          org.apache.spark.sql.types.StructField("cnt", org.apache.spark.sql.types.LongType))))
      Oracle.assertEquivalent(
        sparkCnt,
        s"SELECT count(*) AS cnt FROM cat WHERE $whereClause",
        "cat" -> cat,
      )
    }
  }

  test("MUP identification runs on TPC-H-lite and the algorithms agree") {
    val data = SparkCoverage.collectCompressed(cat, attrs, cards)
    val tau  = (data.total / 50).max(1L) // 2%
    val a = DeepDiver.findMups(data, tau).mups
    val b = PatternBreaker.findMups(data, tau).mups
    assert(a == b)
    // rare corner (high quantity bucket × high discount bucket with A-flag)
    // exists in the space, so with a 1% threshold some region is uncovered
    assert(a.nonEmpty, s"expected some MUPs at tau=$tau over cards $cards")
  }

  test("distributed finder agrees on the bucketized lineitem") {
    val data = SparkCoverage.collectCompressed(cat, attrs, cards)
    val tau  = (data.total / 50).max(1L)
    val expected = DeepDiver.findMups(data, tau).mups
    val got = SparkMupFinder.findMups(cat, attrs, cards, tau)
    assert(got.mups == expected)
  }
}
