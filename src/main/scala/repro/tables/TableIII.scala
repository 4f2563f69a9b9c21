package repro.tables

import repro.core.IIM
import repro.data.Generators

/** Table III: cost of learning φ^(ℓ+h) from scratch vs incrementally.
  *
  * The paper's table is analytic (per-step operation counts); the measurable
  * claim behind it — incremental learning turns the per-ℓ cost from linear to
  * constant, giving an order-of-magnitude wall-clock win on a full adaptive
  * sweep (Fig. 12/13) — is reproduced here by timing
  * [[IIM.candidateModelsNaive]] against [[IIM.candidateModels]] on the same
  * neighbour lists, asserting identical outputs.
  */
object TableIII {

  final case class Result(n: Int, lMax: Int, step: Int,
                          scratchMs: Double, incrementalMs: Double, identical: Boolean) {
    def speedup: Double = scratchMs / math.max(incrementalMs, 1e-9)
  }

  /** Analytic rows of the paper's Table III, for reference in the output. */
  val analytic: Seq[(String, String, String)] = Seq(
    ("U", "m^2(l+h)", "m^2 h"),
    ("V", "m(l+h)", "m h"),
    ("U^-1", "m^3", "m^3"),
    ("U^-1 V", "m^2", "m^2"),
  )

  def run(n: Int = 800, lMax: Int = 300, step: Int = 1, seed: Long = 42): Result = {
    val ds = Generators.byName("CA", seed, sizeFactor = n / 6000.0)
    val data = ds.rows.take(n)
    val featIdx = Array(0, 1, 2)
    val targetIdx = 3
    val ls = IIM.ellCandidates(data.length, lMax, step)
    val lists = IIM.neighborLists(data, featIdx, math.max(ls.last, 6))
    // Warm-up JIT on a small slice before timing.
    val warm = data.take(128)
    val warmLists = IIM.neighborLists(warm, featIdx, 32)
    val warmLs = IIM.ellCandidates(warm.length, 32, step)
    IIM.candidateModelsNaive(warm, featIdx, targetIdx, warmLists, warmLs, 1e-3)
    IIM.candidateModels(warm, featIdx, targetIdx, warmLists, warmLs, 1e-3)

    val t0 = System.nanoTime()
    val naive = IIM.candidateModelsNaive(data, featIdx, targetIdx, lists, ls, 1e-3)
    val t1 = System.nanoTime()
    val inc = IIM.candidateModels(data, featIdx, targetIdx, lists, ls, 1e-3)
    val t2 = System.nanoTime()
    val same = naive.indices.forall { i =>
      naive(i).indices.forall(li => naive(i)(li).sameElements(inc(i)(li)))
    }
    Result(data.length, lMax, step, (t1 - t0) / 1e6, (t2 - t1) / 1e6, same)
  }

  def format(r: Result): String = {
    val head = "Computing      From scratch    Incremental"
    val rows = analytic.map { case (c, s, i) => f"$c%-12s $s%14s $i%14s" }
    (Seq(head) ++ rows ++ Seq(
      f"measured: n=${r.n} lMax=${r.lMax} h=${r.step} " +
        f"scratch=${r.scratchMs}%.1f ms incremental=${r.incrementalMs}%.1f ms " +
        f"speedup=${r.speedup}%.1fx identical=${r.identical}"
    )).mkString("\n")
  }
}
