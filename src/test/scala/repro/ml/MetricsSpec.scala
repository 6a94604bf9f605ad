package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("accuracy on hand-computed cases") {
    assert(Metrics.accuracy(Seq(1, 0, 1, 1), Seq(1, 0, 0, 1)) == 0.75)
    assert(Metrics.accuracy(Seq(0, 0), Seq(0, 0)) == 1.0)
    assert(Metrics.accuracy(Seq(1, 1), Seq(0, 0)) == 0.0)
  }

  test("f1 on hand-computed cases") {
    // tp=2, fp=1, fn=1 → precision 2/3, recall 2/3 → f1 = 2/3
    val f = Metrics.f1(Seq(1, 1, 1, 0, 0), Seq(1, 1, 0, 1, 0))
    assert(math.abs(f - 2.0 / 3.0) < 1e-12)
  }

  test("f1 is 0 when nothing is predicted positive") {
    assert(Metrics.f1(Seq(0, 0, 0), Seq(1, 1, 0)) == 0.0)
  }

  test("perfect prediction gives accuracy and f1 of 1") {
    assert(Metrics.accuracy(Seq(1, 0, 1), Seq(1, 0, 1)) == 1.0)
    assert(Metrics.f1(Seq(1, 0, 1), Seq(1, 0, 1)) == 1.0)
  }

  test("length mismatch and empty inputs are rejected") {
    intercept[IllegalArgumentException](Metrics.accuracy(Seq(1), Seq(1, 0)))
    intercept[IllegalArgumentException](Metrics.f1(Seq.empty, Seq.empty))
  }
}
