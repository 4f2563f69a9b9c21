package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.tables.TableIII

/** Reproduction of Table III's claim: incremental computation makes per-ℓ
  * learning constant-time, which shows up as an order-of-magnitude wall-clock
  * win on a full adaptive sweep (paper Figs. 12–13 report ~10x).
  */
class TableIIIBench extends AnyFunSuite {

  private lazy val result = TableIII.run(n = 1200, lMax = 400, step = 1)

  test("Table III: print analytic costs and measured speedup") {
    println("=== Table III: from-scratch vs incremental learning (reproduction) ===")
    println(TableIII.format(result))
  }

  test("Table III: incremental and from-scratch models are bitwise identical") {
    assert(result.identical)
  }

  test("Table III: incremental learning is at least 3x faster on a full sweep") {
    assert(result.speedup > 3.0, f"speedup=${result.speedup}%.2f")
  }

  test("Table III: stepping reduces from-scratch cost too (h=50 like Fig. 12)") {
    val stepped = TableIII.run(n = 1200, lMax = 400, step = 50)
    assert(stepped.identical)
    assert(stepped.scratchMs < result.scratchMs, "stepping must cut the sweep cost")
  }
}
