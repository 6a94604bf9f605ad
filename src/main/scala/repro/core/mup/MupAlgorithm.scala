package repro.core.mup

import repro.core.{CompressedData, Pattern}

/** Result of a MUP search: the MUP set plus work counters for the benches. */
final case class MupResult(
    mups: Set[Pattern],
    nodesVisited: Long,
    covCalls: Long,
) {
  /** MUP count per level ℓ (paper Fig 6 / §V-B census). */
  def levelHistogram: Map[Int, Int] =
    mups.groupBy(_.level).view.mapValues(_.size).toMap
}

/** Common interface for the MUP identification algorithms (Problem 1).
  *
  * `maxLevel`, when smaller than `d`, restricts the search to MUPs with
  * ℓ(P) <= maxLevel (the level-limited mode of paper §V-C3 / Fig 16). A
  * pattern's MUP-ness at level ℓ depends only on itself and its parents, so
  * the truncated answer is exactly the subset of full-answer MUPs with level
  * <= maxLevel for the top-down algorithms.
  */
trait MupAlgorithm {
  def name: String
  def findMups(data: CompressedData, tau: Long, maxLevel: Int = Int.MaxValue): MupResult
}
