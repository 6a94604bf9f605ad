package repro.spark

import repro.SparkSpec
import repro.core.mup.DeepDiver

/** The distributed level-wise PATTERN-BREAKER vs the in-memory search. */
class SparkMupFinderSpec extends SparkSpec {

  test("COMPAS: distributed finder equals DeepDiver at τ=10") {
    val df = CoverageData.compas(spark).cache()
    val data = SparkCoverage.collectCompressed(df, CoverageData.compasAttrs, CoverageData.compasCards)
    val expected = DeepDiver.findMups(data, 10).mups
    val got = SparkMupFinder.findMups(df, CoverageData.compasAttrs, CoverageData.compasCards, 10)
    assert(got.mups == expected)
    assert(expected.nonEmpty)
  }

  test("COMPAS: level-limited distributed search returns MUPs with level <= 2") {
    val df = CoverageData.compas(spark).cache()
    val data = SparkCoverage.collectCompressed(df, CoverageData.compasAttrs, CoverageData.compasCards)
    val expected = DeepDiver.findMups(data, 10).mups.filter(_.level <= 2)
    val got = SparkMupFinder.findMups(df, CoverageData.compasAttrs, CoverageData.compasCards, 10, maxLevel = 2)
    assert(got.mups == expected)
  }

  test("AirBnB-like sample: distributed finder equals DeepDiver across thresholds") {
    val d = 5
    val df = CoverageData.airbnb(spark, n = 2000, d = d).cache()
    val attrs = CoverageData.attrNames(d)
    val cards = CoverageData.airbnbCards(d)
    val data = SparkCoverage.collectCompressed(df, attrs, cards)
    for (tau <- Seq(1L, 20L, 200L)) {
      val expected = DeepDiver.findMups(data, tau).mups
      val got = SparkMupFinder.findMups(df, attrs, cards, tau)
      assert(got.mups == expected, s"tau=$tau")
    }
  }

  test("BlueNile-like sample: high-cardinality attributes work through grouping sets") {
    val df = CoverageData.bluenile(spark, n = 3000).cache()
    val attrs = CoverageData.attrNames(7)
    val cards = CoverageData.bluenileCards
    val data = SparkCoverage.collectCompressed(df, attrs, cards)
    val expected = DeepDiver.findMups(data, 30, maxLevel = 3).mups
    val got = SparkMupFinder.findMups(df, attrs, cards, 30, maxLevel = 3)
    assert(got.mups == expected)
  }
}
