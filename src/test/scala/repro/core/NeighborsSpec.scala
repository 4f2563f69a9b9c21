package repro.core

import org.scalatest.funsuite.AnyFunSuite

class NeighborsSpec extends AnyFunSuite {

  private val data = Array(
    Array(0.0, 10.0),
    Array(1.0, 20.0),
    Array(2.0, 30.0),
    Array(5.0, 40.0),
    Array(9.0, 50.0),
  )
  private val featIdx = Array(0)

  test("distance implements Formula 1 (normalised Euclidean)") {
    val d = Neighbors.distance(Array(3.0, 4.0), Array(0, 1), Array(0.0, 0.0))
    assert(math.abs(d - math.sqrt(25.0 / 2.0)) < 1e-12)
  }

  test("distance over a single attribute is |difference|") {
    assert(Neighbors.distance(Array(7.0, 99.0), featIdx, Array(3.0)) == 4.0)
  }

  test("nearest returns ascending-distance order") {
    val nn = Neighbors.nearest(data, featIdx, Array(1.9), 3)
    assert(nn.sameElements(Array(2, 1, 0)))
  }

  test("nearest includes an exact match first") {
    val nn = Neighbors.nearest(data, featIdx, Array(5.0), 2)
    assert(nn(0) == 3)
  }

  test("nearest with count >= n returns all rows") {
    val nn = Neighbors.nearest(data, featIdx, Array(0.0), 10)
    assert(nn.length == 5 && nn.toSet == Set(0, 1, 2, 3, 4))
  }

  test("nearest excludes the requested row") {
    val nn = Neighbors.nearest(data, featIdx, Array(0.0), 5, exclude = 0)
    assert(nn.length == 4 && !nn.contains(0))
  }

  test("nearest breaks distance ties by row index") {
    val tied = Array(Array(1.0), Array(3.0), Array(3.0), Array(5.0))
    val nn = Neighbors.nearest(tied, Array(0), Array(4.0), 3)
    // distances: 3.0→1, 3.0→1, then 1.0 for rows 1,2,3: order is 1 (d=1), 2 (d=1), 3 (d=1)?
    // Row 3 at distance 1, rows 1,2 at distance 1 as well; tie → index order.
    assert(nn.sameElements(Array(1, 2, 3)))
  }

  test("nearest matches brute force on random data") {
    val rnd = new scala.util.Random(99)
    for (trial <- 1 to 20) {
      val n = 30 + rnd.nextInt(40)
      val d = Array.fill(n)(Array(rnd.nextDouble() * 10, rnd.nextDouble() * 10, rnd.nextDouble() * 10))
      val fi = Array(0, 2)
      val q = Array(rnd.nextDouble() * 10, rnd.nextDouble() * 10)
      val k = 1 + rnd.nextInt(10)
      val got = Neighbors.nearest(d, fi, q, k)
      val want = d.indices
        .sortBy(i => (Neighbors.distance(d(i), fi, q), i))
        .take(k)
      assert(got.sameElements(want), s"trial=$trial")
    }
  }

  test("nearest with empty result when excluding the only row") {
    val nn = Neighbors.nearest(Array(Array(1.0)), Array(0), Array(1.0), 3, exclude = 0)
    assert(nn.isEmpty)
  }

  test("project extracts feature order") {
    assert(Neighbors.project(Array(10.0, 20.0, 30.0), Array(2, 0)).sameElements(Array(30.0, 10.0)))
  }

  test("nearest is deterministic across calls") {
    val q = Array(2.2)
    val a = Neighbors.nearest(data, featIdx, q, 4)
    val b = Neighbors.nearest(data, featIdx, q, 4)
    assert(a.sameElements(b))
  }
}
