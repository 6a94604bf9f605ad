package repro.core.mup

import repro.core.{CompressedData, InvertedIndex, Pattern}

/** The naïve baseline of paper §III-A: enumerate all `Π (c_i + 1)` patterns,
  * compute every coverage, then discard uncovered patterns dominated by
  * another uncovered pattern. Exponential in `d` — usable only on small
  * graphs, which is exactly how the paper uses it (it "did not finish for any
  * of the settings within the time limit").
  */
object NaiveMup extends MupAlgorithm {
  val name = "Naive"

  def findMups(data: CompressedData, tau: Long, maxLevel: Int = Int.MaxValue): MupResult = {
    val index = new InvertedIndex(data)
    var visited = 0L
    val uncovered = Pattern.allPatterns(data.cards).filter { p =>
      visited += 1
      index.cov(p) < tau
    }.toVector

    // O(u^2) maximality filter: drop any uncovered pattern dominated by
    // another uncovered pattern.
    val mups = uncovered.filter { p =>
      p.level <= maxLevel && !uncovered.exists(q => q.dominates(p))
    }
    MupResult(mups.toSet, visited, index.covCalls)
  }
}
