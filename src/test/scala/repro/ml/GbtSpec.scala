package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class GbtSpec extends AnyFunSuite {

  test("Gbt fits a step function almost exactly") {
    val rnd = new scala.util.Random(1)
    val xs = Array.fill(200)(Array(rnd.nextDouble() * 10))
    val ys = xs.map(x => if (x(0) < 5) -3.0 else 3.0)
    val model = Gbt.train(xs, ys, rounds = 30, depth = 2)
    assert(math.abs(model.predict(Array(1.0)) - (-3.0)) < 0.3)
    assert(math.abs(model.predict(Array(9.0)) - 3.0) < 0.3)
  }

  test("Gbt training reduces residuals monotonically in rounds") {
    val rnd = new scala.util.Random(2)
    val xs = Array.fill(300)(Array(rnd.nextDouble() * 6, rnd.nextDouble() * 6))
    val ys = xs.map(x => math.sin(x(0)) * 3 + x(1))
    def rmsOf(rounds: Int): Double = {
      val m = Gbt.train(xs, ys, rounds = rounds, depth = 3)
      math.sqrt(xs.indices.map(i => math.pow(m.predict(xs(i)) - ys(i), 2)).sum / xs.length)
    }
    val few = rmsOf(5); val many = rmsOf(50)
    assert(many < few, s"5 rounds rms=$few, 50 rounds rms=$many")
  }

  test("Gbt captures an interaction a linear model cannot (XOR-like)") {
    val rnd = new scala.util.Random(3)
    val xs = Array.fill(400)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val ys = xs.map(x => if ((x(0) < 0.5) == (x(1) < 0.5)) 5.0 else -5.0)
    val model = Gbt.train(xs, ys, rounds = 60, depth = 3)
    assert(model.predict(Array(0.2, 0.2)) > 2.0)
    assert(model.predict(Array(0.2, 0.8)) < -2.0)
  }

  test("Gbt on constant targets predicts the constant") {
    val xs = Array.tabulate(50)(i => Array(i.toDouble))
    val ys = Array.fill(50)(4.2)
    val model = Gbt.train(xs, ys, rounds = 10, depth = 2)
    assert(math.abs(model.predict(Array(25.0)) - 4.2) < 1e-9)
  }

  test("Gbt respects minChild (no split on tiny leaves)") {
    val xs = Array.tabulate(8)(i => Array(i.toDouble))
    val ys = Array(0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 100.0)
    // minChild = 5 forbids isolating the outlier: prediction stays smoothed.
    val model = Gbt.train(xs, ys, rounds = 5, depth = 2, minChild = 5)
    assert(model.predict(Array(7.0)) < 90.0)
  }

  test("Gbt predictions are deterministic") {
    val rnd = new scala.util.Random(4)
    val xs = Array.fill(100)(Array(rnd.nextDouble(), rnd.nextDouble()))
    val ys = xs.map(x => x(0) * 2 - x(1))
    val a = Gbt.train(xs, ys, 20, 3).predict(Array(0.4, 0.6))
    val b = Gbt.train(xs, ys, 20, 3).predict(Array(0.4, 0.6))
    assert(a == b)
  }

  test("base prediction is the target mean") {
    val xs = Array.tabulate(4)(i => Array(i.toDouble))
    val model = Gbt.train(xs, Array(1.0, 2.0, 3.0, 4.0), rounds = 1, depth = 1)
    assert(model.base == 2.5)
  }
}
