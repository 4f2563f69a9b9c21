package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class KMeansSpec extends AnyFunSuite {

  private def blobs(n: Int, seed: Long): (Array[Array[Double]], Array[Int]) = {
    val rnd = new scala.util.Random(seed)
    val centers = Array(Array(0.0, 0.0), Array(10.0, 10.0), Array(0.0, 10.0))
    val data = new Array[Array[Double]](n)
    val labels = new Array[Int](n)
    for (i <- 0 until n) {
      val c = i % 3
      labels(i) = c
      data(i) = Array(centers(c)(0) + rnd.nextGaussian() * 0.3, centers(c)(1) + rnd.nextGaussian() * 0.3)
    }
    (data, labels)
  }

  test("KMeans separates well-separated blobs with purity 1.0") {
    val (data, truth) = blobs(150, 1)
    val model = KMeans.fit(data, 3, seed = 7)
    assert(Metrics.purity(model.labels, truth) == 1.0)
  }

  test("KMeans centroids land near the true centres") {
    val (data, _) = blobs(300, 2)
    val model = KMeans.fit(data, 3, seed = 7)
    val found = model.centroids.map(c => (math.round(c(0) / 5) * 5, math.round(c(1) / 5) * 5)).toSet
    assert(found == Set((0L, 0L), (10L, 10L), (0L, 10L)))
  }

  test("KMeans is deterministic for a fixed seed") {
    val (data, _) = blobs(120, 3)
    val a = KMeans.fit(data, 3, seed = 5).labels
    val b = KMeans.fit(data, 3, seed = 5).labels
    assert(a.sameElements(b))
  }

  test("KMeans with k=1 assigns everything to one cluster") {
    val (data, _) = blobs(60, 4)
    val model = KMeans.fit(data, 1, seed = 1)
    assert(model.labels.forall(_ == 0))
  }

  test("NaN-aware KMeans still clusters rows with missing entries") {
    val (data, truth) = blobs(150, 5)
    val rnd = new scala.util.Random(6)
    val holed = data.map { r =>
      val c = r.clone(); if (rnd.nextDouble() < 0.3) c(rnd.nextInt(2)) = Double.NaN; c
    }
    val model = KMeans.fit(holed, 3, seed = 7)
    // Purity degrades but stays far above chance (~1/3).
    assert(Metrics.purity(model.labels, truth) > 0.7)
  }

  test("NaN-aware KMeans centroids contain no NaN") {
    val data = Array(Array(1.0, Double.NaN), Array(1.1, 2.0), Array(0.9, 2.1), Array(5.0, 6.0))
    val model = KMeans.fit(data, 2, seed = 3)
    assert(model.centroids.flatten.forall(v => !v.isNaN))
  }

  test("labels length matches input length") {
    val (data, _) = blobs(90, 8)
    assert(KMeans.fit(data, 3, seed = 1).labels.length == 90)
  }
}
