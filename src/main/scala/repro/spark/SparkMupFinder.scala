package repro.spark

import org.apache.spark.sql.DataFrame
import repro.core.Pattern
import repro.core.mup.MupResult
import scala.collection.mutable

/** Distributed level-wise PATTERN-BREAKER.
  *
  * Same search as [[repro.core.mup.PatternBreaker]], but the per-level
  * coverage of the candidate frontier is computed by Spark: candidates are
  * grouped by deterministic attribute set and answered with batched
  * `GROUP BY GROUPING SETS` aggregations over the compressed table
  * ([[SparkCoverage.patternCoverage]]). The driver only ever holds the
  * frontier and the compressed-table *schema* — never the raw rows — so this
  * variant scales to datasets whose combo table does not fit the driver.
  */
object SparkMupFinder {

  def findMups(
      df: DataFrame,
      attrs: Seq[String],
      cards: IndexedSeq[Int],
      tau: Long,
      maxLevel: Int = Int.MaxValue,
  ): MupResult = {
    val d   = cards.length
    val cap = math.min(d, maxLevel)
    val compressed = SparkCoverage.compress(df, attrs).cache()
    try {
      val mups = mutable.Set.empty[Pattern]
      var visited  = 0L
      var covCalls = 0L

      var frontier: Vector[Pattern] = Vector(Pattern.root(d))
      var coveredPrev: Set[Pattern] = Set.empty
      var level = 0
      while (frontier.nonEmpty && level <= cap) {
        // Drop candidates with an uncovered ancestor before spending a query.
        val candidates = frontier.filter(p => level == 0 || p.parents.forall(coveredPrev.contains))
        visited += frontier.length
        val cov = SparkCoverage.patternCoverage(compressed, attrs, candidates)
        covCalls += candidates.length
        val coveredHere = mutable.Set.empty[Pattern]
        for (p <- candidates) {
          if (cov(p) < tau) mups += p else coveredHere += p
        }
        val next = Vector.newBuilder[Pattern]
        if (level < cap) for (p <- coveredHere) next ++= p.childrenRule1(cards)
        coveredPrev = coveredHere.toSet
        frontier = next.result()
        level += 1
      }
      MupResult(mups.toSet, visited, covCalls)
    } finally compressed.unpersist()
  }
}
