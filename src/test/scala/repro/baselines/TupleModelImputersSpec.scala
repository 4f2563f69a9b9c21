package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

class TupleModelImputersSpec extends AnyFunSuite {

  private val fi = Array(0, 1)
  private val ti = 2

  private def clusteredData(seed: Long = 3): Array[Array[Double]] = {
    // Two tight clusters with constant targets 10 and 20.
    val rnd = new scala.util.Random(seed)
    Array.tabulate(40) { i =>
      if (i % 2 == 0) Array(rnd.nextDouble() * 0.1, rnd.nextDouble() * 0.1, 10.0)
      else Array(5.0 + rnd.nextDouble() * 0.1, 5.0 + rnd.nextDouble() * 0.1, 20.0)
    }
  }

  test("Mean imputes the global target mean for every query") {
    val data = Array(Array(0.0, 0.0, 1.0), Array(1.0, 1.0, 3.0), Array(2.0, 2.0, 5.0))
    val got = new MeanImputer().imputeAll(data, fi, ti, Array(Array(0.5, 0.5), Array(9.0, 9.0)), 0L)
    assert(got.sameElements(Array(3.0, 3.0)))
  }

  test("Mean ignores the query position entirely") {
    val data = clusteredData()
    val got = new MeanImputer().imputeAll(data, fi, ti, Array(Array(0.0, 0.0), Array(5.0, 5.0)), 0L)
    assert(got(0) == got(1))
  }

  test("kNN imputes the local cluster value") {
    val data = clusteredData()
    val got = new KnnImputer(3).imputeAll(data, fi, ti, Array(Array(0.05, 0.05), Array(5.05, 5.05)), 0L)
    assert(got(0) == 10.0 && got(1) == 20.0)
  }

  test("kNN with k = n equals the Mean imputer") {
    val data = clusteredData()
    val q = Array(Array(2.0, 2.0))
    val knn = new KnnImputer(data.length).imputeAll(data, fi, ti, q, 0L)(0)
    val mean = new MeanImputer().imputeAll(data, fi, ti, q, 0L)(0)
    assert(math.abs(knn - mean) < 1e-9)
  }

  test("kNN implements Formula 2 (arithmetic mean of neighbour targets)") {
    val data = Array(Array(0.0, 0.0, 1.0), Array(1.0, 0.0, 2.0), Array(2.0, 0.0, 4.0), Array(50.0, 0.0, 99.0))
    val got = new KnnImputer(3).imputeAll(data, fi, ti, Array(Array(0.0, 0.0)), 0L)(0)
    assert(math.abs(got - (1.0 + 2.0 + 4.0) / 3.0) < 1e-12)
  }

  test("kNNE on a 1-feature problem degenerates to kNN") {
    val data = clusteredData()
    val oneFeat = Array(0)
    val q = Array(Array(0.05))
    val knn = new KnnImputer(3).imputeAll(data, oneFeat, ti, q, 0L)(0)
    val knne = new KnnEImputer(3).imputeAll(data, oneFeat, ti, q, 0L)(0)
    assert(math.abs(knn - knne) < 1e-12)
  }

  test("kNNE averages over leave-one-attribute-out subsets") {
    val data = clusteredData()
    val got = new KnnEImputer(3).imputeAll(data, fi, ti, Array(Array(0.05, 0.05)), 0L)(0)
    assert(got == 10.0) // both subsets agree on the tight cluster
  }

  test("kNNE differs from kNN when one attribute is misleading") {
    // Feature 1 agrees with clusters, feature 0 is noise.
    val rnd = new scala.util.Random(9)
    val data = Array.tabulate(40) { i =>
      if (i % 2 == 0) Array(rnd.nextDouble() * 10, 0.0 + rnd.nextDouble() * 0.1, 10.0)
      else Array(rnd.nextDouble() * 10, 5.0 + rnd.nextDouble() * 0.1, 20.0)
    }
    val q = Array(Array(5.0, 0.05))
    val knne = new KnnEImputer(3).imputeAll(data, fi, ti, q, 0L)(0)
    assert(knne >= 10.0 && knne <= 20.0)
  }

  test("ILLS recovers a local linear relation better than plain kNN mean") {
    // Single global linear y = 3x0 + 2x1; sparse queries far from any tuple.
    val rnd = new scala.util.Random(17)
    val data = Array.fill(80)(Array(rnd.nextDouble() * 10, rnd.nextDouble() * 10, 0.0))
      .map(r => Array(r(0), r(1), 3.0 * r(0) + 2.0 * r(1)))
    val q = Array(Array(4.4, 6.6))
    val truth = 3.0 * 4.4 + 2.0 * 6.6
    val ills = new IllsImputer().imputeAll(data, fi, ti, q, 0L)(0)
    val knn = new KnnImputer(5).imputeAll(data, fi, ti, q, 0L)(0)
    assert(math.abs(ills - truth) <= math.abs(knn - truth) + 1e-9)
    assert(math.abs(ills - truth) < 0.5)
  }

  test("ILLS output is finite on clustered data") {
    val data = clusteredData()
    val got = new IllsImputer().imputeAll(data, fi, ti, Array(Array(0.0, 0.0), Array(5.0, 5.0)), 0L)
    assert(got.forall(v => !v.isNaN && !v.isInfinite))
  }

  test("all tuple-model imputers are deterministic given the seed") {
    val data = clusteredData()
    val q = Array(Array(1.0, 2.0), Array(4.0, 4.0))
    for (imp <- Seq(new MeanImputer(), new KnnImputer(3), new KnnEImputer(3), new IllsImputer())) {
      val a = imp.imputeAll(data, fi, ti, q, 7L)
      val b = imp.imputeAll(data, fi, ti, q, 7L)
      assert(a.sameElements(b), imp.name)
    }
  }

  test("imputer names match the paper's Table II headers") {
    assert(new MeanImputer().name == "Mean")
    assert(new KnnImputer().name == "kNN")
    assert(new KnnEImputer().name == "kNNE")
    assert(new IllsImputer().name == "ILLS")
  }
}
