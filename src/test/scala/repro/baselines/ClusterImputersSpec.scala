package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

class ClusterImputersSpec extends AnyFunSuite {

  private val fi = Array(0, 1)
  private val ti = 2

  private def twoClusters(seed: Long = 5): Array[Array[Double]] = {
    val rnd = new scala.util.Random(seed)
    Array.tabulate(60) { i =>
      if (i % 2 == 0) Array(rnd.nextGaussian() * 0.2, rnd.nextGaussian() * 0.2, 10.0 + rnd.nextGaussian() * 0.1)
      else Array(8.0 + rnd.nextGaussian() * 0.2, 8.0 + rnd.nextGaussian() * 0.2, 20.0 + rnd.nextGaussian() * 0.1)
    }
  }

  test("IFC imputes near the local cluster's target mean") {
    val data = twoClusters()
    val got = new IfcImputer(c = 2).imputeAll(data, fi, ti, Array(Array(0.0, 0.0), Array(8.0, 8.0)), 1L)
    assert(math.abs(got(0) - 10.0) < 1.0, s"got ${got(0)}")
    assert(math.abs(got(1) - 20.0) < 1.0, s"got ${got(1)}")
  }

  test("IFC membership-weighted output lies within the target range") {
    val data = twoClusters()
    val got = new IfcImputer(c = 2).imputeAll(data, fi, ti, Array(Array(4.0, 4.0)), 1L)(0)
    assert(got > 9.0 && got < 21.0)
  }

  test("GMM imputes near the local component's target mean") {
    val data = twoClusters()
    val got = new GmmImputer(c = 2).imputeAll(data, fi, ti, Array(Array(0.0, 0.0), Array(8.0, 8.0)), 1L)
    assert(math.abs(got(0) - 10.0) < 1.0, s"got ${got(0)}")
    assert(math.abs(got(1) - 20.0) < 1.0, s"got ${got(1)}")
  }

  test("GMM posterior uses only the observed attributes") {
    // Clusters separated on feature 0 only; query far on target scale is irrelevant.
    val rnd = new scala.util.Random(8)
    val data = Array.tabulate(60) { i =>
      if (i % 2 == 0) Array(0.0 + rnd.nextGaussian() * 0.1, 100.0) else Array(9.0 + rnd.nextGaussian() * 0.1, -100.0)
    }
    val got = new GmmImputer(c = 2).imputeAll(data, Array(0), 1, Array(Array(0.0)), 1L)(0)
    assert(math.abs(got - 100.0) < 5.0, s"got $got")
  }

  test("cluster imputers are deterministic given the seed") {
    val data = twoClusters()
    val q = Array(Array(1.0, 1.0))
    for (imp <- Seq(new IfcImputer(2), new GmmImputer(2))) {
      val a = imp.imputeAll(data, fi, ti, q, 9L)
      val b = imp.imputeAll(data, fi, ti, q, 9L)
      assert(a.sameElements(b), imp.name)
    }
  }

  test("cluster imputer names match Table II") {
    assert(new IfcImputer().name == "IFC")
    assert(new GmmImputer().name == "GMM")
  }
}
