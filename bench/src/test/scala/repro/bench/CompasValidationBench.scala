package repro.bench

import repro.core.{InvertedIndex, Pattern}
import repro.core.mup.DeepDiver
import repro.ml.{DecisionTree, Metrics}
import repro.spark.{CoverageData, SparkCoverage}
import scala.util.Random

/** Paper §V-B validation on the COMPAS stand-in:
  *
  *  1. the coverage audit at τ = 10 (65 MUPs in the paper: 19 at level 2,
  *     23 at level 3, 23 at level 4; all single attribute values covered;
  *     `XX23` = widowed Hispanics has exactly 2 rows, both recidivists);
  *  2. Fig 11 — decision-tree accuracy/F1 on a 20-person Hispanic-female
  *     test set while the training data contains {0, 20, 40, 60, 80} HF.
  */
class CompasValidationBench extends BenchHarness {

  private lazy val df = CoverageData.compas(spark).cache()

  test("§V-B1: MUP census of the COMPAS stand-in at tau = 10") {
    val attrs = CoverageData.compasAttrs
    val cards = CoverageData.compasCards
    val data  = SparkCoverage.collectCompressed(df, attrs, cards)
    val index = new InvertedIndex(data)

    // all single-attribute values covered at τ=10 (as in the paper)
    val level1Uncovered = (0 until 4).flatMap { i =>
      (0 until cards(i)).map { v =>
        Pattern(Vector.fill(4)(Pattern.X).updated(i, v))
      }
    }.filter(p => index.cov(p) < 10)
    val (res, secs) = timed(DeepDiver.findMups(data, 10))
    val hist = res.levelHistogram
    val xx23 = Pattern.parse("XX23")
    printTable(
      "CompasAudit MUPs at tau=10 (paper: 65 total; 19@L2, 23@L3, 23@L4)",
      Seq("metric", "value"),
      Seq(
        Seq("rows", data.total.toString),
        Seq("uncovered single-attr values", level1Uncovered.size.toString),
        Seq("MUPs total", res.mups.size.toString),
        Seq("MUPs level 2", hist.getOrElse(2, 0).toString),
        Seq("MUPs level 3", hist.getOrElse(3, 0).toString),
        Seq("MUPs level 4", hist.getOrElse(4, 0).toString),
        Seq("cov(XX23) widowed Hispanics", index.cov(xx23).toString),
        Seq("XX23 uncovered", (index.cov(xx23) < 10).toString),
        Seq("identification seconds", f2(secs)),
      ))
    assert(level1Uncovered.isEmpty, "paper reports all single values covered")
    assert(index.cov(xx23) == 2L)
    assert(res.mups.nonEmpty)
  }

  test("Fig 11: classifier accuracy/F1 on Hispanic females vs HF coverage in training") {
    val all = df.collect().map { r =>
      (Vector(r.getAs[Int]("sex"), r.getAs[Int]("age"), r.getAs[Int]("race"),
              r.getAs[Int]("marital")), r.getAs[Int]("recid"))
    }.toVector
    val rnd = new Random(2019L)
    val (hf, rest) = all.partition { case (x, _) => x(0) == 1 && x(2) == 2 }
    assert(hf.size == 100)
    val shuffledHf = rnd.shuffle(hf)
    val testHf  = shuffledHf.take(20)
    val poolHf  = shuffledHf.drop(20) // 80 available for training

    // paper's context numbers: overall accuracy/F1 on a random test set
    val shuffledAll = rnd.shuffle(rest)
    val split = (shuffledAll.size * 0.8).toInt
    val overallTree = new DecisionTree(maxDepth = 6, minSamplesSplit = 8, minSamplesLeaf = 32)
      .fit(shuffledAll.take(split).map(_._1), shuffledAll.take(split).map(_._2))
    val overallPred = shuffledAll.drop(split).map(t => overallTree.predict(t._1))
    val overallTruth = shuffledAll.drop(split).map(_._2)

    val rows = for (k <- Seq(0, 20, 40, 60, 80)) yield {
      val train = rest ++ poolHf.take(k)
      // min_samples_leaf = 32: an HF branch only forms once the group has
      // enough coverage — the paper reads the accuracy knee (~40) as a good
      // coverage threshold, aligned with the CLT rule of thumb of 30.
      val tree = new DecisionTree(maxDepth = 6, minSamplesSplit = 8, minSamplesLeaf = 32)
        .fit(train.map(_._1), train.map(_._2))
      val pred  = testHf.map(t => tree.predict(t._1))
      val truth = testHf.map(_._2)
      Seq(k.toString, f2(Metrics.accuracy(pred, truth)), f2(Metrics.f1(pred.map(1 - _), truth.map(1 - _))))
    }
    printTable(
      "Fig11 HF test-set performance vs #HF in training " +
        f"(overall random-test acc=${Metrics.accuracy(overallPred, overallTruth)}%.2f, " +
        f"f1=${Metrics.f1(overallPred, overallTruth)}%.2f)",
      Seq("#HF in training", "accuracy(HF test)", "f1(HF test, non-recid as positive)"),
      rows)
    // shape assertion: full HF coverage beats zero HF coverage
    val accAt = rows.map(r => r.head.toInt -> r(1).toDouble).toMap
    assert(accAt(80) > accAt(0), s"coverage remediation should improve HF accuracy: $accAt")
  }
}
