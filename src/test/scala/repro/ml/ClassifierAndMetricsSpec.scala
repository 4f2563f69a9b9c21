package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class ClassifierAndMetricsSpec extends AnyFunSuite {

  test("KnnClassifier separates clean blobs") {
    val rnd = new scala.util.Random(1)
    val xs = Array.tabulate(100)(i =>
      if (i % 2 == 0) Array(rnd.nextGaussian() * 0.2, 0.0) else Array(5.0 + rnd.nextGaussian() * 0.2, 0.0))
    val ys = Array.tabulate(100)(_ % 2)
    assert(KnnClassifier.predict(xs, ys, Array(0.1, 0.0), 5) == 0)
    assert(KnnClassifier.predict(xs, ys, Array(4.9, 0.0), 5) == 1)
  }

  test("KnnClassifier handles NaN dimensions in the query") {
    val xs = Array(Array(0.0, 0.0), Array(0.1, 0.1), Array(5.0, 5.0), Array(5.1, 5.1))
    val ys = Array(0, 0, 1, 1)
    assert(KnnClassifier.predict(xs, ys, Array(Double.NaN, 0.05), 2) == 0)
  }

  test("crossValidate predicts every row exactly once") {
    val rnd = new scala.util.Random(2)
    val xs = Array.fill(50)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val ys = Array.tabulate(50)(_ % 2)
    val (pred, truth) = KnnClassifier.crossValidate(xs, ys, 3, 5, seed = 9)
    assert(pred.length == 50 && truth.sameElements(ys))
  }

  test("crossValidate achieves high F1 on separable data") {
    val rnd = new scala.util.Random(3)
    val xs = Array.tabulate(100)(i =>
      if (i % 2 == 0) Array(rnd.nextGaussian() * 0.3) else Array(6.0 + rnd.nextGaussian() * 0.3))
    val ys = Array.tabulate(100)(_ % 2)
    val (pred, truth) = KnnClassifier.crossValidate(xs, ys, 3, 5, seed = 9)
    assert(Metrics.f1Weighted(pred, truth) > 0.95)
  }

  test("rms of identical arrays is zero") {
    assert(Metrics.rms(Array(1.0, 2.0), Array(1.0, 2.0)) == 0.0)
  }

  test("rms matches a hand computation") {
    assert(math.abs(Metrics.rms(Array(0.0, 0.0), Array(3.0, 4.0)) - math.sqrt(12.5)) < 1e-12)
  }

  test("r2 of perfect predictions is 1") {
    assert(Metrics.r2(Array(1.0, 2.0, 3.0), Array(1.0, 2.0, 3.0)) == 1.0)
  }

  test("r2 of mean predictions is 0") {
    assert(math.abs(Metrics.r2(Array(1.0, 2.0, 3.0), Array(2.0, 2.0, 2.0))) < 1e-12)
  }

  test("r2 can be negative for bad predictors") {
    assert(Metrics.r2(Array(1.0, 2.0, 3.0), Array(30.0, -5.0, 7.0)) < 0.0)
  }

  test("purity of perfect clustering is 1") {
    assert(Metrics.purity(Array(0, 0, 1, 1), Array(5, 5, 9, 9)) == 1.0)
  }

  test("purity of a fully mixed clustering is 1/2 on two balanced classes") {
    assert(Metrics.purity(Array(0, 0, 0, 0), Array(1, 1, 2, 2)) == 0.5)
  }

  test("purity is label-permutation invariant") {
    val truth = Array(0, 0, 1, 1, 2, 2)
    assert(Metrics.purity(Array(2, 2, 0, 0, 1, 1), truth) == 1.0)
  }

  test("f1Weighted of perfect predictions is 1") {
    assert(Metrics.f1Weighted(Array(0, 1, 0, 1), Array(0, 1, 0, 1)) == 1.0)
  }

  test("f1Weighted penalises misclassification") {
    val f1 = Metrics.f1Weighted(Array(0, 0, 0, 0), Array(0, 0, 1, 1))
    assert(f1 > 0.3 && f1 < 0.7)
  }

  test("f1Weighted of all-wrong predictions is 0") {
    assert(Metrics.f1Weighted(Array(1, 1, 0, 0), Array(0, 0, 1, 1)) == 0.0)
  }
}
