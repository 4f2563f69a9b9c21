package repro.core

/** Nearest-neighbour search over the complete relation.
  *
  * Distance is the per-attribute-normalised Euclidean distance of the paper's
  * Formula 1. Queries are *projected* feature vectors (values in `featIdx`
  * order); relation rows are full tuples addressed through `featIdx`.
  *
  * Search is a single scan with a bounded max-heap, O(n log c) for c
  * neighbours — the paper explicitly leaves indexing out of scope (§III-A3).
  * Ties are broken by row index so results are deterministic.
  */
object Neighbors {

  /** Formula 1: sqrt(Σ_{A∈F} (q[A]-t[A])² / |F|), with q already projected. */
  def distance(row: Array[Double], featIdx: Array[Int], q: Array[Double]): Double = {
    var s = 0.0; var a = 0
    while (a < featIdx.length) {
      val d = q(a) - row(featIdx(a))
      s += d * d
      a += 1
    }
    math.sqrt(s / featIdx.length)
  }

  /** Indices of the `count` nearest rows of `data` to projected query `q`,
    * sorted by ascending (distance, index). `exclude` removes one row
    * (a validation tuple is not its own neighbour, §V-A Example 4).
    */
  def nearest(data: Array[Array[Double]], featIdx: Array[Int], q: Array[Double],
              count: Int, exclude: Int = -1): Array[Int] = {
    val n = data.length
    val c = math.min(count, if (exclude >= 0 && exclude < n) n - 1 else n)
    if (c <= 0) return Array.emptyIntArray
    // Bounded max-heap over (dist, idx); root is the worst kept candidate.
    val hd = new Array[Double](c)
    val hi = new Array[Int](c)
    var size = 0

    def worse(d1: Double, i1: Int, d2: Double, i2: Int): Boolean =
      d1 > d2 || (d1 == d2 && i1 > i2)

    def siftUp(pos0: Int): Unit = {
      var pos = pos0
      while (pos > 0) {
        val par = (pos - 1) >> 1
        if (worse(hd(pos), hi(pos), hd(par), hi(par))) {
          val td = hd(pos); hd(pos) = hd(par); hd(par) = td
          val ti = hi(pos); hi(pos) = hi(par); hi(par) = ti
          pos = par
        } else return
      }
    }

    def siftDown(): Unit = {
      var pos = 0
      while (true) {
        val l = 2 * pos + 1; val r = l + 1
        var m = pos
        if (l < size && worse(hd(l), hi(l), hd(m), hi(m))) m = l
        if (r < size && worse(hd(r), hi(r), hd(m), hi(m))) m = r
        if (m == pos) return
        val td = hd(pos); hd(pos) = hd(m); hd(m) = td
        val ti = hi(pos); hi(pos) = hi(m); hi(m) = ti
        pos = m
      }
    }

    var i = 0
    while (i < n) {
      if (i != exclude) {
        val d = distance(data(i), featIdx, q)
        if (size < c) {
          hd(size) = d; hi(size) = i; size += 1; siftUp(size - 1)
        } else if (worse(hd(0), hi(0), d, i)) {
          hd(0) = d; hi(0) = i; siftDown()
        }
      }
      i += 1
    }
    // Extract ascending by (dist, idx).
    val pairs = Array.tabulate(size)(j => (hd(j), hi(j)))
    scala.util.Sorting.stableSort(pairs, (a: (Double, Int), b: (Double, Int)) =>
      a._1 < b._1 || (a._1 == b._1 && a._2 < b._2))
    pairs.map(_._2)
  }

  /** Project a full row onto the feature indices. */
  def project(row: Array[Double], featIdx: Array[Int]): Array[Double] = {
    val out = new Array[Double](featIdx.length)
    var a = 0
    while (a < featIdx.length) { out(a) = row(featIdx(a)); a += 1 }
    out
  }
}
