package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** CompressedData + InvertedIndex coverage oracles (paper Appendix A). */
class CoverageOracleSpec extends AnyFunSuite {

  /** Example 1 of the paper: t1:010 t2:001 t3:000 t4:011 t5:001. */
  private def example1: CompressedData =
    CompressedData.fromRows(
      Seq(Vector(0, 1, 0), Vector(0, 0, 1), Vector(0, 0, 0), Vector(0, 1, 1), Vector(0, 0, 1)),
      Vector(2, 2, 2))

  test("compression aggregates duplicates (001 appears twice)") {
    val d = example1
    assert(d.total == 5L)
    assert(d.distinctCombos == 4)
  }

  test("Appendix A worked example: cov(0X1) = 3") {
    val d = example1
    assert(d.coverageScan(Pattern.parse("0X1")) == 3L)
    assert(new InvertedIndex(d).cov(Pattern.parse("0X1")) == 3L)
  }

  test("root coverage equals dataset size") {
    val d = example1
    assert(new InvertedIndex(d).cov(Pattern.root(3)) == 5L)
  }

  test("Example 1: cov(1XX) = 0, so 1XX is uncovered at any τ >= 1") {
    val d = example1
    assert(new InvertedIndex(d).cov(Pattern.parse("1XX")) == 0L)
  }

  test("out-of-range and misshapen rows are rejected") {
    intercept[IllegalArgumentException] {
      CompressedData.fromRows(Seq(Vector(0, 5)), Vector(2, 2))
    }
    intercept[IllegalArgumentException] {
      CompressedData.fromRows(Seq(Vector(0)), Vector(2, 2))
    }
  }

  // One registered test per randomized dataset: inverted index and scan
  // oracle must both equal direct row counting on every pattern.
  {
    val rnd = new Random(20260814L)
    for (trial <- 0 until 30) {
      val d     = 1 + rnd.nextInt(4)
      val cards = Vector.fill(d)(2 + rnd.nextInt(3))
      val n     = 1 + rnd.nextInt(60)
      val rows  = Vector.fill(n)(Vector.tabulate(d)(i => rnd.nextInt(cards(i))))
      test(s"oracle agreement trial $trial: cards=$cards n=$n") {
        val data  = CompressedData.fromRows(rows, cards)
        val index = new InvertedIndex(data)
        for (p <- Pattern.allPatterns(cards)) {
          val direct = rows.count(p.matches).toLong
          assert(data.coverageScan(p) == direct, s"scan $p")
          assert(index.cov(p) == direct, s"index $p")
        }
      }
    }
  }

  test("coverage is monotone: parents cover at least as much as children") {
    val rnd = new Random(99L)
    val cards = Vector(2, 3, 2)
    val rows  = Vector.fill(40)(Vector.tabulate(3)(i => rnd.nextInt(cards(i))))
    val index = new InvertedIndex(CompressedData.fromRows(rows, cards))
    for (p <- Pattern.allPatterns(cards); q <- p.parents)
      assert(index.cov(q) >= index.cov(p), s"$q vs $p")
  }

  test("PATTERN-COMBINER identity: cov(P) = Σ cov(children partitioning on one X)") {
    val rnd = new Random(7L)
    val cards = Vector(2, 2, 3)
    val rows  = Vector.fill(50)(Vector.tabulate(3)(i => rnd.nextInt(cards(i))))
    val index = new InvertedIndex(CompressedData.fromRows(rows, cards))
    for (p <- Pattern.allPatterns(cards) if p.level < 3; i <- 0 until 3 if !p.isDet(i)) {
      val parts = (0 until cards(i)).map(v => index.cov(Pattern(p.elems.updated(i, v))))
      assert(parts.sum == index.cov(p), s"$p on attr $i")
    }
  }

  test("covCalls counter increments per call") {
    val index = new InvertedIndex(example1)
    val before = index.covCalls
    index.cov(Pattern.parse("XXX")); index.cov(Pattern.parse("0X1"))
    assert(index.covCalls == before + 2)
  }

  test("empty dataset: every pattern has coverage 0") {
    val data  = CompressedData.fromRows(Seq.empty[Vector[Int]], Vector(2, 2))
    val index = new InvertedIndex(data)
    for (p <- Pattern.allPatterns(Vector(2, 2))) assert(index.cov(p) == 0L)
  }

  test("fromAggregated round-trips counts") {
    val data = CompressedData.fromAggregated(
      Seq((Vector(0, 1), 7L), (Vector(1, 0), 3L)), Vector(2, 2))
    assert(data.total == 10L)
    val index = new InvertedIndex(data)
    assert(index.cov(Pattern.parse("0X")) == 7L)
    assert(index.cov(Pattern.parse("X0")) == 3L)
    assert(index.cov(Pattern.parse("11")) == 0L)
  }
}
