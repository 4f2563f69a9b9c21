package repro.ml

/** k-nearest-neighbour classifier (the paper's Table VII uses Weka's ibk).
  *
  * Distance is Euclidean over the dimensions observed in *both* rows,
  * renormalised by the number of observed dimensions, so the classifier also
  * runs on data that still contains NaN — that is the un-imputed "Missing"
  * column of Table VII.
  */
object KnnClassifier {

  private def dist(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var cnt = 0; var j = 0
    while (j < a.length) {
      if (!a(j).isNaN && !b(j).isNaN) { val d = a(j) - b(j); s += d * d; cnt += 1 }
      j += 1
    }
    if (cnt == 0) Double.MaxValue else math.sqrt(s / cnt)
  }

  /** Majority vote over the k nearest training rows (ties → smaller label). */
  def predict(trainX: Array[Array[Double]], trainY: Array[Int], x: Array[Double], k: Int): Int = {
    val idx = trainX.indices.sortBy(i => (dist(trainX(i), x), i)).take(k)
    idx.map(trainY).groupBy(identity).toSeq
      .map { case (lbl, g) => (lbl, g.length) }
      .maxBy { case (lbl, cnt) => (cnt, -lbl) }._1
  }

  /** Stratified-ish 5-fold cross validation; returns (predicted, truth) pairs. */
  def crossValidate(xs: Array[Array[Double]], ys: Array[Int], k: Int, folds: Int,
                    seed: Long): (Array[Int], Array[Int]) = {
    val rnd = new scala.util.Random(seed)
    val order = rnd.shuffle(xs.indices.toList).toArray
    val pred = new Array[Int](xs.length)
    var f = 0
    while (f < folds) {
      val test = order.indices.filter(_ % folds == f).map(order)
      val train = order.indices.filter(_ % folds != f).map(order)
      val tx = train.map(xs).toArray
      val ty = train.map(ys).toArray
      test.foreach(i => pred(i) = predict(tx, ty, xs(i), k))
      f += 1
    }
    (pred, ys)
  }
}
