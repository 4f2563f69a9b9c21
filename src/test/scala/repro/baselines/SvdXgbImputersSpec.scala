package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

class SvdXgbImputersSpec extends AnyFunSuite {

  private val fi = Array(0, 1)
  private val ti = 2

  test("SVD reconstructs a rank-1 relation exactly") {
    // All rows are multiples of (1, 2, 3): covariance has rank 1.
    val rnd = new scala.util.Random(2)
    val data = Array.fill(50) { val t = rnd.nextDouble() * 10 - 5; Array(t, 2 * t, 3 * t) }
    val got = new SvdImputer(rank = 1).imputeAll(data, fi, ti, Array(Array(2.0, 4.0)), 0L)(0)
    assert(math.abs(got - 6.0) < 1e-3, s"got $got") // ε-ridge in the Gram solve bounds accuracy
  }

  test("SVD handles a rank-2 latent structure") {
    val rnd = new scala.util.Random(3)
    val data = Array.fill(120) {
      val a = rnd.nextDouble() * 4 - 2; val b = rnd.nextDouble() * 4 - 2
      Array(a + b, a - b, 2 * a + 0.5 * b, a)
    }
    val got = new SvdImputer(rank = 2).imputeAll(data, Array(0, 1, 3), 2, Array(Array(1.0, 1.0, 1.0)), 0L)(0)
    // a+b=1, a−b=1, a=1 → a=1, b=0 → target = 2.
    assert(math.abs(got - 2.0) < 0.1, s"got $got")
  }

  test("SVD default rank is positive and bounded") {
    val rnd = new scala.util.Random(4)
    val data = Array.fill(30)(Array(rnd.nextDouble(), rnd.nextDouble(), rnd.nextDouble()))
    val got = new SvdImputer().imputeAll(data, fi, ti, Array(Array(0.5, 0.5)), 0L)(0)
    assert(!got.isNaN && !got.isInfinite)
  }

  test("XGB fits a nonlinear step function that linear models miss") {
    val rnd = new scala.util.Random(5)
    val data = Array.fill(300) {
      val x = rnd.nextDouble() * 10
      Array(x, rnd.nextDouble(), if (x < 5) 1.0 else 9.0)
    }
    val xgb = new XgbImputer().imputeAll(data, fi, ti, Array(Array(2.0, 0.5), Array(8.0, 0.5)), 0L)
    assert(math.abs(xgb(0) - 1.0) < 0.5, s"got ${xgb(0)}")
    assert(math.abs(xgb(1) - 9.0) < 0.5, s"got ${xgb(1)}")
    val glr = new GlrImputer().imputeAll(data, fi, ti, Array(Array(2.0, 0.5)), 0L)(0)
    assert(math.abs(xgb(0) - 1.0) < math.abs(glr - 1.0))
  }

  test("XGB approximates a smooth linear relation reasonably") {
    val rnd = new scala.util.Random(6)
    val data = Array.fill(400) {
      val x0 = rnd.nextDouble() * 10; val x1 = rnd.nextDouble() * 10
      Array(x0, x1, x0 + x1)
    }
    val got = new XgbImputer(rounds = 60).imputeAll(data, fi, ti, Array(Array(5.0, 5.0)), 0L)(0)
    assert(math.abs(got - 10.0) < 1.0, s"got $got")
  }

  test("XGB is deterministic") {
    val rnd = new scala.util.Random(7)
    val data = Array.fill(100)(Array(rnd.nextDouble(), rnd.nextDouble(), rnd.nextDouble() * 5))
    val q = Array(Array(0.3, 0.7))
    assert(new XgbImputer().imputeAll(data, fi, ti, q, 0L)(0) ==
      new XgbImputer().imputeAll(data, fi, ti, q, 0L)(0))
  }

  test("names match Table II") {
    assert(new SvdImputer().name == "SVD")
    assert(new XgbImputer().name == "XGB")
  }
}
