package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** The CART stand-in for the paper's scikit-learn classifier (§V-B2). */
class DecisionTreeSpec extends AnyFunSuite {

  test("fits a single-attribute rule exactly") {
    val rows = Vector(Vector(0, 0), Vector(0, 1), Vector(1, 0), Vector(1, 1),
                      Vector(0, 0), Vector(1, 1))
    val labels = rows.map(_.head)
    val t = new DecisionTree(maxDepth = 3, minSamplesSplit = 2).fit(rows, labels)
    assert(rows.map(t.predict) == labels)
  }

  test("fits XOR with depth 2 (multiway categorical splits)") {
    val rows = for (a <- Vector(0, 1); b <- Vector(0, 1); _ <- 0 until 3) yield Vector(a, b)
    val labels = rows.map(r => r(0) ^ r(1))
    val t = new DecisionTree(maxDepth = 2, minSamplesSplit = 2).fit(rows, labels)
    assert(rows.map(t.predict) == labels)
  }

  test("pure node becomes a leaf without splitting") {
    val rows = Vector(Vector(0, 1), Vector(1, 0), Vector(0, 0))
    val t = new DecisionTree().fit(rows, Vector(1, 1, 1))
    assert(t.predict(Vector(1, 1)) == 1)
  }

  test("unseen branch value falls back to the node majority — the coverage failure mode") {
    // attribute 0 has values {0,1} in training; value 2 never seen.
    val rows = Vector.fill(10)(Vector(0, 0)) ++ Vector.fill(10)(Vector(1, 0))
    val labels = Vector.fill(10)(1) ++ Vector.fill(10)(0)
    val t = new DecisionTree(maxDepth = 3, minSamplesSplit = 2).fit(rows, labels)
    // tie at the root (10 vs 10) → majority rule returns 1
    assert(t.predict(Vector(2, 0)) == 1)
  }

  test("maxDepth = 0 yields the majority classifier") {
    val rows = Vector(Vector(0), Vector(1), Vector(0))
    val t = new DecisionTree(maxDepth = 0).fit(rows, Vector(1, 0, 1))
    assert(rows.map(t.predict) == Vector(1, 1, 1))
  }

  test("predict before fit is rejected; shape mismatches are rejected") {
    intercept[IllegalArgumentException](new DecisionTree().predict(Vector(0)))
    intercept[IllegalArgumentException](new DecisionTree().fit(Vector(Vector(0)), Vector(0, 1)))
    intercept[IllegalArgumentException](new DecisionTree().fit(Vector.empty, Vector.empty))
  }

  test("minSamplesLeaf blocks splits that would create an undersized branch") {
    // attribute 0 groups: value 0 → 20 rows (label 1), value 1 → 3 rows (label 0).
    val rows = Vector.fill(20)(Vector(0)) ++ Vector.fill(3)(Vector(1))
    val labels = Vector.fill(20)(1) ++ Vector.fill(3)(0)
    val gated = new DecisionTree(maxDepth = 3, minSamplesSplit = 2, minSamplesLeaf = 5)
      .fit(rows, labels)
    // split blocked → majority (1) predicted even for value 1
    assert(gated.predict(Vector(1)) == 1)
    val free = new DecisionTree(maxDepth = 3, minSamplesSplit = 2, minSamplesLeaf = 1)
      .fit(rows, labels)
    assert(free.predict(Vector(1)) == 0)
  }

  test("learns a noisy two-attribute interaction better than the majority baseline") {
    val rnd = new Random(123L)
    def label(r: Vector[Int]): Int = {
      val p = if (r(0) == 1 && r(1) == 2) 0.9 else 0.2
      if (rnd.nextDouble() < p) 1 else 0
    }
    val rows = Vector.fill(2000)(Vector(rnd.nextInt(2), rnd.nextInt(3), rnd.nextInt(2)))
    val labels = rows.map(label)
    val t = new DecisionTree(maxDepth = 4, minSamplesSplit = 8).fit(rows, labels)
    val test = Vector.fill(500)(Vector(rnd.nextInt(2), rnd.nextInt(3), rnd.nextInt(2)))
    val testLabels = test.map(label)
    val acc = Metrics.accuracy(t.predictAll(test), testLabels)
    val majAcc = math.max(testLabels.count(_ == 1), testLabels.count(_ == 0)).toDouble / 500
    assert(acc > majAcc + 0.02, s"tree acc $acc vs majority $majAcc")
  }
}
