package repro.ml

/** Evaluation metrics used across the reproduced tables. */
object Metrics {

  /** RMS imputation error (§VI-A2). */
  def rms(truth: Array[Double], imputed: Array[Double]): Double = {
    require(truth.length == imputed.length && truth.nonEmpty, "length mismatch")
    var s = 0.0; var i = 0
    while (i < truth.length) { val d = truth(i) - imputed(i); s += d * d; i += 1 }
    math.sqrt(s / truth.length)
  }

  /** Coefficient of determination R² = 1 − SSE/SST of predictions vs truth;
    * used for the paper's R²_S (predictions = kNN) and R²_H (= GLR) columns.
    */
  def r2(truth: Array[Double], pred: Array[Double]): Double = {
    val mean = truth.sum / truth.length
    var sse = 0.0; var sst = 0.0; var i = 0
    while (i < truth.length) {
      val e = truth(i) - pred(i); sse += e * e
      val t = truth(i) - mean; sst += t * t
      i += 1
    }
    if (sst <= 0.0) 0.0 else 1.0 - sse / sst
  }

  /** Clustering purity (§VI-D1): fraction of points in the most common truth
    * class of their predicted cluster.
    */
  def purity(predicted: Array[Int], truth: Array[Int]): Double = {
    require(predicted.length == truth.length && truth.nonEmpty, "length mismatch")
    val byCluster = predicted.indices.groupBy(predicted)
    val correct = byCluster.values.map { members =>
      members.groupBy(truth).values.map(_.size).max
    }.sum
    correct.toDouble / truth.length
  }

  /** Weighted-average F1 over classes (Weka's default summary for ibk). */
  def f1Weighted(predicted: Array[Int], truth: Array[Int]): Double = {
    require(predicted.length == truth.length && truth.nonEmpty, "length mismatch")
    val classes = truth.distinct
    val n = truth.length.toDouble
    classes.map { c =>
      val tp = truth.indices.count(i => predicted(i) == c && truth(i) == c).toDouble
      val fp = truth.indices.count(i => predicted(i) == c && truth(i) != c).toDouble
      val fn = truth.indices.count(i => predicted(i) != c && truth(i) == c).toDouble
      val prec = if (tp + fp == 0) 0.0 else tp / (tp + fp)
      val rec = if (tp + fn == 0) 0.0 else tp / (tp + fn)
      val f1 = if (prec + rec == 0) 0.0 else 2 * prec * rec / (prec + rec)
      f1 * truth.count(_ == c) / n
    }.sum
  }
}
