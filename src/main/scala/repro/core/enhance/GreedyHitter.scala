package repro.core.enhance

import repro.core.Pattern

/** The efficient greedy hitting-set of paper §IV-B (Algorithms 4 and 5).
  *
  * GREEDY repeatedly asks `hit-count` for the value combination hitting the
  * most still-unhit patterns, clears those patterns from the filter, and
  * stops when every pattern is hit. `hit-count` walks the value-combination
  * tree (Fig 10) depth-first, carrying the AND of the inverted indices along
  * the path as a bit-vector filter; children are visited in descending order
  * of their remaining-hit upper bound and a branch is pruned as soon as that
  * bound cannot beat the best complete combination found so far.
  */
object GreedyHitter {

  /** Result: combinations to collect plus work counters for the benches. */
  final case class Result(combos: Vector[Vector[Int]], nodesExplored: Long)

  /** Run GREEDY over the patterns to hit. Returns the chosen combinations in
    * selection order. Patterns must be non-empty-hittable (every pattern is
    * hit by at least one combination — always true for patterns over the same
    * attribute domain).
    */
  def run(patterns: IndexedSeq[Pattern], cards: IndexedSeq[Int]): Result = {
    if (patterns.isEmpty) return Result(Vector.empty, 0L)
    val idx    = new PatternHitIndex(patterns, cards)
    val filter = idx.fullFilter
    val out    = Vector.newBuilder[Vector[Int]]
    var explored = 0L

    while (idx.popcount(filter) > 0) {
      val search = new HitCountSearch(idx, cards)
      val best   = search.best(filter)
      explored += search.nodes
      require(best.count > 0, "no combination hits any remaining pattern")
      val combo = best.combo
      out += combo
      // Clear the patterns this combination hits.
      val hit = idx.hitsOf(combo, filter)
      var w = 0
      while (w < filter.length) { filter(w) &= ~hit(w); w += 1 }
    }
    Result(out.result(), explored)
  }

  /** One invocation of Algorithm 4 over the whole tree. */
  private final class HitCountSearch(idx: PatternHitIndex, cards: IndexedSeq[Int]) {
    private val d = cards.length
    var nodes  = 0L
    private var bestCount = 0
    private var bestCombo: Vector[Int] = _
    private val prefix = new Array[Int](d)

    final case class Best(count: Int, combo: Vector[Int])

    def best(filter: Array[Long]): Best = {
      bestCount = 0
      bestCombo = null
      descend(filter, 0)
      Best(bestCount, if (bestCombo == null) Vector.empty else bestCombo)
    }

    private def descend(filter: Array[Long], i: Int): Unit = {
      nodes += 1
      if (i == d) {
        val cnt = idx.popcount(filter)
        if (cnt > bestCount) { bestCount = cnt; bestCombo = prefix.toVector }
        return
      }
      // Compute each child's filter and upper bound, then visit descending.
      val c = cards(i)
      val childFilters = new Array[Array[Long]](c)
      val childCounts  = new Array[Int](c)
      var v = 0
      while (v < c) {
        val f = new Array[Long](idx.words)
        childCounts(v) = idx.andInto(filter, i, v, f)
        childFilters(v) = f
        v += 1
      }
      val order = (0 until c).sortBy(v => -childCounts(v))
      for (v <- order) {
        // The popcount of the child's filter is an upper bound on what any
        // completion can hit; prune when it cannot beat the incumbent.
        // (At the last level the bound is exact, so > keeps the first
        // maximum and ties break toward lexicographically earlier combos.)
        if (childCounts(v) > bestCount) {
          prefix(i) = v
          if (i == d - 1) {
            nodes += 1
            bestCount = childCounts(v)
            bestCombo = prefix.toVector
          } else descend(childFilters(v), i + 1)
        }
      }
    }
  }
}
