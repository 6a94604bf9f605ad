package repro.core.enhance

import repro.core.Pattern

/** Direct implementation of the greedy hitting-set approximation (the
  * "naïve" comparator of paper §V-C4): every round scans all `Π c_i` value
  * combinations, counts for each how many still-unhit patterns it matches,
  * and picks the max. Exponential per round — only for small settings.
  */
object NaiveHitter {

  final case class Result(combos: Vector[Vector[Int]], combosScanned: Long)

  def run(patterns: IndexedSeq[Pattern], cards: IndexedSeq[Int]): Result = {
    if (patterns.isEmpty) return Result(Vector.empty, 0L)
    val unhit = scala.collection.mutable.BitSet(patterns.indices: _*)
    val out   = Vector.newBuilder[Vector[Int]]
    var scanned = 0L

    while (unhit.nonEmpty) {
      var bestCombo: Vector[Int] = null
      var bestHits = -1
      for (combo <- Pattern.allCombos(cards)) {
        scanned += 1
        var hits = 0
        for (j <- unhit) if (patterns(j).matches(combo)) hits += 1
        if (hits > bestHits) { bestHits = hits; bestCombo = combo }
      }
      require(bestHits > 0, "no combination hits any remaining pattern")
      out += bestCombo
      for (j <- unhit.toSeq) if (patterns(j).matches(bestCombo)) unhit -= j
    }
    Result(out.result(), scanned)
  }

  /** The max hit-count a single combination can achieve against `patterns` —
    * used by tests to cross-check GREEDY's per-round choice.
    */
  def maxHitCount(patterns: IndexedSeq[Pattern], cards: IndexedSeq[Int]): Int = {
    var best = 0
    for (combo <- Pattern.allCombos(cards)) {
      var hits = 0
      for (p <- patterns) if (p.matches(combo)) hits += 1
      if (hits > best) best = hits
    }
    best
  }
}
