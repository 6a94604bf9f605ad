package repro.ml

/** Binary-classification metrics (positive class = 1), as reported in the
  * paper's Fig 11 (accuracy and F1).
  */
object Metrics {

  def accuracy(pred: Seq[Int], truth: Seq[Int]): Double = {
    require(pred.length == truth.length && pred.nonEmpty, "length mismatch or empty")
    pred.lazyZip(truth).count { case (p, t) => p == t }.toDouble / pred.length
  }

  def f1(pred: Seq[Int], truth: Seq[Int]): Double = {
    require(pred.length == truth.length && pred.nonEmpty, "length mismatch or empty")
    val tp = pred.lazyZip(truth).count { case (p, t) => p == 1 && t == 1 }
    val fp = pred.lazyZip(truth).count { case (p, t) => p == 1 && t == 0 }
    val fn = pred.lazyZip(truth).count { case (p, t) => p == 0 && t == 1 }
    if (tp == 0) 0.0
    else {
      val prec = tp.toDouble / (tp + fp)
      val rec  = tp.toDouble / (tp + fn)
      2 * prec * rec / (prec + rec)
    }
  }
}
