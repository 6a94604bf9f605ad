package repro.spark

import repro.SparkSpec

/** Synthetic dataset generators: determinism, shape, and the engineered
  * structure the validation experiments rely on (DESIGN.md §3).
  */
class CoverageDataSpec extends SparkSpec {

  test("compas: exactly 6,889 rows like the paper's dataset") {
    assert(CoverageData.compas(spark).count() == 6889L)
  }

  test("compas: values respect the cardinalities (2,4,4,7) and label is 0/1") {
    val df = CoverageData.compas(spark)
    val agg = df.selectExpr(
      "max(sex)", "max(age)", "max(race)", "max(marital)", "min(sex)", "min(age)",
      "min(race)", "min(marital)", "min(recid)", "max(recid)").head()
    assert(agg.getInt(0) <= 1 && agg.getInt(1) <= 3 && agg.getInt(2) <= 3 && agg.getInt(3) <= 6)
    assert(agg.getInt(4) >= 0 && agg.getInt(5) >= 0 && agg.getInt(6) >= 0 && agg.getInt(7) >= 0)
    assert(agg.getInt(8) >= 0 && agg.getInt(9) <= 1)
  }

  test("compas: exactly two widowed Hispanics (XX23), one male one female, both recidivists") {
    val wh = CoverageData.compas(spark).filter("race = 2 AND marital = 3").collect()
    assert(wh.length == 2)
    assert(wh.map(_.getAs[Int]("sex")).sorted.toSeq == Seq(0, 1))
    assert(wh.forall(_.getAs[Int]("recid") == 1))
  }

  test("compas: exactly 100 Hispanic females, minority-labelled mostly non-recidivist") {
    val hf = CoverageData.compas(spark).filter("race = 2 AND sex = 1")
    assert(hf.count() == 100L)
    val recidRate = hf.filter("recid = 1").count().toDouble / 100.0
    assert(recidRate < 0.45, s"HF recid rate $recidRate should be minority-low")
  }

  test("compas: every single attribute value has at least 10 instances (paper §V-B1)") {
    val df = CoverageData.compas(spark).cache()
    for ((attr, card) <- CoverageData.compasAttrs.zip(CoverageData.compasCards); v <- 0 until card) {
      val c = df.filter(s"$attr = $v").count()
      assert(c >= 10L, s"$attr=$v has only $c instances")
    }
  }

  test("compas is deterministic in the seed") {
    val a = CoverageData.compas(spark).groupBy("sex", "age", "race", "marital", "recid")
      .count().collect().map(_.toSeq).toSet
    val b = CoverageData.compas(spark).groupBy("sex", "age", "race", "marital", "recid")
      .count().collect().map(_.toSeq).toSet
    assert(a == b)
  }

  test("airbnb: n rows, d binary attributes") {
    val df = CoverageData.airbnb(spark, n = 500, d = 8)
    assert(df.count() == 500L)
    assert(df.columns.toSeq == CoverageData.attrNames(8))
    val mm = df.selectExpr("max(a0)", "min(a0)", "max(a7)", "min(a7)").head()
    assert(mm.getInt(0) <= 1 && mm.getInt(1) >= 0)
  }

  test("airbnb: per-attribute rates vary (some rare, some common)") {
    val df = CoverageData.airbnb(spark, n = 20000, d = 12, seed = 42).cache()
    val rates = (0 until 12).map(i => df.filter(s"a$i = 1").count().toDouble / 20000.0)
    assert(rates.min < 0.25, s"expected at least one rare attribute, got $rates")
    assert(rates.max > 0.55, s"expected at least one common attribute, got $rates")
  }

  test("airbnb is deterministic across invocations and independent of partition count") {
    def sig(df: org.apache.spark.sql.DataFrame): Seq[Long] =
      (0 until 6).map(i => df.filter(s"a$i = 1").count())
    val a = CoverageData.airbnb(spark, 2000, 6)
    val b = CoverageData.airbnb(spark, 2000, 6).repartition(3)
    assert(sig(a) == sig(b))
  }

  test("bluenile: default 116,300 rows with the paper's cardinalities") {
    val df = CoverageData.bluenile(spark, n = 5000).cache()
    assert(df.count() == 5000L)
    for ((c, i) <- CoverageData.bluenileCards.zipWithIndex) {
      val mx = df.selectExpr(s"max(a$i)").head().getInt(0)
      val mn = df.selectExpr(s"min(a$i)").head().getInt(0)
      assert(mx <= c - 1 && mn >= 0, s"attr $i out of range")
    }
  }

  test("bluenile marginals are skewed (value 0 most frequent)") {
    val df = CoverageData.bluenile(spark, n = 20000).cache()
    for (i <- 0 until 7) {
      val byV = df.groupBy(s"a$i").count().collect()
        .map(r => r.getAs[Int](0) -> r.getAs[Long](1)).toMap
      val top = byV.maxBy(_._2)._1
      assert(top == 0, s"attr $i most frequent value is $top, expected 0 (Zipf)")
    }
  }
}
