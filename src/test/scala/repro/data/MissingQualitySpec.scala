package repro.data

import org.scalatest.funsuite.AnyFunSuite

class MissingQualitySpec extends AnyFunSuite {

  private def rows(n: Int, m: Int, seed: Long = 1): Array[Array[Double]] = {
    val rnd = new scala.util.Random(seed)
    Array.fill(n)(Array.fill(m)(rnd.nextDouble() * 10))
  }

  test("inject removes the requested fraction of tuples") {
    val p = Missing.inject(rows(200, 4), frac = 0.05, seed = 3)
    assert(p.queries.length == 10 && p.complete.length == 190)
  }

  test("inject with count overrides frac") {
    val p = Missing.inject(rows(200, 4), frac = 0.5, seed = 3, count = 7)
    assert(p.queries.length == 7 && p.complete.length == 193)
  }

  test("inject with fixed attr only removes that attribute") {
    val p = Missing.inject(rows(100, 5), frac = 0.1, seed = 4, attr = 2)
    assert(p.queries.forall(_.attr == 2))
  }

  test("inject with random attr covers several attributes") {
    val p = Missing.inject(rows(500, 5), frac = 0.2, seed = 5)
    assert(p.queries.map(_.attr).distinct.length >= 3)
  }

  test("query truth matches the original cell") {
    val data = rows(50, 3)
    val p = Missing.inject(data, frac = 0.1, seed = 6)
    p.queries.foreach(q => assert(q.truth == q.row(q.attr)))
  }

  test("injection is deterministic in the seed") {
    val data = rows(100, 4)
    val a = Missing.inject(data, 0.1, seed = 7)
    val b = Missing.inject(data, 0.1, seed = 7)
    assert(a.queries.map(_.truth).sameElements(b.queries.map(_.truth)))
  }

  test("byAttr partitions the queries") {
    val p = Missing.inject(rows(300, 4), 0.2, seed = 8)
    assert(p.byAttr.values.map(_.length).sum == p.queries.length)
  }

  test("injectCells produces NaN holes at roughly the requested rate") {
    val data = rows(1000, 5)
    val holed = Missing.injectCells(data, 0.2, seed = 9)
    val nanFrac = holed.flatten.count(_.isNaN).toDouble / (1000 * 5)
    assert(nanFrac > 0.12 && nanFrac < 0.28, s"nanFrac=$nanFrac")
  }

  test("injectCells keeps at least one observed attribute per row") {
    val holed = Missing.injectCells(rows(500, 3), 0.9, seed = 10)
    holed.foreach(r => assert(r.count(v => !v.isNaN) >= 1))
  }

  test("injectCells does not mutate the input") {
    val data = rows(50, 4)
    val copy = data.map(_.clone())
    Missing.injectCells(data, 0.5, seed = 11)
    assert(data.flatten[Double].sameElements(copy.flatten[Double]))
  }

  test("Quality.r2 on a perfectly linear dataset gives R²_H ≈ 1") {
    val rnd = new scala.util.Random(12)
    val data = Array.fill(400) {
      val a = rnd.nextDouble() * 5; val b = rnd.nextDouble() * 5
      Array(a, b, 1.0 + 2.0 * a - b)
    }
    val p = Missing.inject(data, 0.1, seed = 13, attr = 2)
    val (_, r2h) = Quality.r2(p, attr = 2)
    assert(r2h > 0.99, s"r2h=$r2h")
  }

  test("Quality.r2 on pure noise gives low R² for both measures") {
    val p = Missing.inject(rows(400, 3, seed = 14), 0.1, seed = 15, attr = 2)
    val (r2s, r2h) = Quality.r2(p, attr = 2)
    assert(r2s < 0.5 && r2h < 0.5, s"r2s=$r2s r2h=$r2h")
  }

  test("Quality.r2Avg weights attribute groups by query count") {
    val p = Missing.inject(rows(300, 3, seed = 16), 0.2, seed = 17)
    val (r2s, r2h) = Quality.r2Avg(p)
    assert(!r2s.isNaN && !r2h.isNaN)
  }

  test("Quality.r2 rejects an attribute with no queries") {
    val p = Missing.inject(rows(100, 3), 0.1, seed = 18, attr = 0)
    assertThrows[IllegalArgumentException](Quality.r2(p, attr = 1))
  }
}
