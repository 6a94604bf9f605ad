package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Pattern-graph combinatorics vs the paper's closed forms (§III-B). */
class PatternGraphSpec extends AnyFunSuite {

  test("Fig 2: three binary attributes give 27 nodes") {
    assert(PatternGraph.nodeCount(Vector(2, 2, 2)) == 27L)
  }

  test("Fig 2: 6 nodes at level 1 and 12 at level 2 (C(d,l)·c^l)") {
    val cards = Vector(2, 2, 2)
    assert(PatternGraph.nodeCountAtLevel(cards, 0) == 1L)
    assert(PatternGraph.nodeCountAtLevel(cards, 1) == 6L)
    assert(PatternGraph.nodeCountAtLevel(cards, 2) == 12L)
    assert(PatternGraph.nodeCountAtLevel(cards, 3) == 8L)
  }

  test("Fig 2: 54 edges, matching c·d·(c+1)^(d-1)") {
    assert(PatternGraph.edgeCount(Vector(2, 2, 2)) == 54L)
    // closed form for uniform cardinality
    for (c <- 2 to 4; d <- 1 to 5) {
      val expected = c.toLong * d * math.pow(c + 1, d - 1).round
      assert(PatternGraph.edgeCount(Vector.fill(d)(c)) == expected, s"c=$c d=$d")
    }
  }

  test("node counts sum across levels to the total") {
    for (cards <- Seq(Vector(2, 3), Vector(2, 2, 2), Vector(3, 2, 4), Vector(2, 3, 2, 2))) {
      val sum = (0 to cards.length).map(PatternGraph.nodeCountAtLevel(cards, _)).sum
      assert(sum == PatternGraph.nodeCount(cards))
    }
  }

  test("level counts match enumeration") {
    for (cards <- Seq(Vector(2, 3), Vector(2, 2, 2), Vector(3, 2, 4))) {
      for (l <- 0 to cards.length) {
        assert(PatternGraph.patternsAtLevel(cards, l).size ==
          PatternGraph.nodeCountAtLevel(cards, l), s"cards=$cards l=$l")
      }
    }
  }

  test("edge count matches enumeration of parent links") {
    for (cards <- Seq(Vector(2, 3), Vector(2, 2, 2), Vector(3, 2, 4))) {
      val edges = Pattern.allPatterns(cards).map(_.parents.size.toLong).sum
      assert(edges == PatternGraph.edgeCount(cards), s"cards=$cards")
    }
  }

  test("BlueNile bottom level has 100,800 nodes; 7 binary attrs have 128 (paper §V-C1)") {
    val bn = Vector(10, 4, 7, 8, 3, 3, 5)
    assert(PatternGraph.nodeCountAtLevel(bn, 7) == 100800L)
    assert(PatternGraph.nodeCountAtLevel(Vector.fill(7)(2), 7) == 128L)
  }
}
