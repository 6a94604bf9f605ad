package repro.core

/** Combinatorics of the pattern graph (paper §III-B, Definition 8) plus
  * small-graph enumeration helpers used by tests and the naïve baseline.
  */
object PatternGraph {

  /** Total number of nodes: `Π (c_i + 1)`. */
  def nodeCount(cards: IndexedSeq[Int]): Long =
    cards.foldLeft(1L)((a, c) => a * (c + 1))

  /** Number of nodes at level ℓ: sum over ℓ-subsets S of attributes of
    * `Π_{i∈S} c_i` (reduces to `C(d,ℓ)·c^ℓ` when all cardinalities equal).
    */
  def nodeCountAtLevel(cards: IndexedSeq[Int], level: Int): Long = {
    // dp(j) = sum of products over j-subsets of the cards seen so far
    val dp = Array.fill(level + 1)(0L)
    dp(0) = 1L
    for (c <- cards; j <- math.min(level, cards.length) to 1 by -1)
      dp(j) += dp(j - 1) * c
    dp(level)
  }

  /** Total number of parent-child edges. For uniform cardinality `c` this is
    * the closed form `c · d · (c+1)^(d-1)`; in general each node P at level
    * ℓ has `Σ_{i∈A_P} c_i` children, summed via a product expansion.
    */
  def edgeCount(cards: IndexedSeq[Int]): Long = {
    // Each edge is (parent P', child P) where the child specializes one X of
    // the parent. Equivalently: sum over nodes P of ℓ(P) (each node has ℓ(P)
    // parents). Σ_P ℓ(P) = Σ_i c_i · Π_{j≠i}(c_j+1).
    val d = cards.length
    var sum = 0L
    for (i <- 0 until d) {
      var prod = 1L
      for (j <- 0 until d if j != i) prod *= (cards(j) + 1)
      sum += cards(i) * prod
    }
    sum
  }

  /** Enumerate every pattern at the given level. Intended for small graphs. */
  def patternsAtLevel(cards: IndexedSeq[Int], level: Int): Iterator[Pattern] =
    Pattern.allPatterns(cards).filter(_.level == level)
}
