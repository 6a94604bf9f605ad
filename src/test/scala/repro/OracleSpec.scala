package repro

import org.apache.spark.sql.functions._

/** The DuckDB oracle is itself load-bearing test infrastructure: verify it
  * accepts genuinely equivalent results and rejects wrong ones.
  */
class OracleSpec extends SparkSpec {

  import spark.implicits._

  test("accepts an equivalent aggregation") {
    val df = Seq(("a", 1), ("a", 2), ("b", 3)).toDF("k", "v")
    val agg = df.groupBy("k").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(agg, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
  }

  test("rejects a result with a wrong count") {
    val df = Seq(("a", 1), ("a", 2), ("b", 3)).toDF("k", "v")
    val wrong = Seq(("a", 1L), ("b", 1L)).toDF("k", "cnt") // a should be 2
    val e = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
    }
    assert(e.getMessage.contains("result mismatch"))
  }

  test("rejects a result with missing rows") {
    val df = Seq(("a", 1), ("b", 2)).toDF("k", "v")
    val wrong = Seq(("a", 1L)).toDF("k", "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
    }
  }

  test("rejects mismatched output columns (aliasing discipline)") {
    val df = Seq(("a", 1)).toDF("k", "v")
    val misnamed = Seq(("a", 1L)).toDF("k", "n")
    val e = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(misnamed, "SELECT k, count(*) AS cnt FROM t GROUP BY k", "t" -> df)
    }
    assert(e.getMessage.contains("column mismatch"))
  }

  test("canonicalizes NULLs and numeric formatting") {
    val df = Seq((Some("a"), Some(1.5)), (None, None)).toDF("k", "v")
    Oracle.assertEquivalent(
      df.select($"k", $"v"),
      "SELECT k, CAST(v AS DOUBLE) AS v FROM t",
      "t" -> df)
  }
}
