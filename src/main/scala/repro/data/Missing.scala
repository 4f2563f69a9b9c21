package repro.data

import scala.util.Random

/** Missing-value injection following §VI-A2: randomly pick a set of tuples
  * as incomplete, removing the value of one (given or random) attribute; the
  * remaining tuples form the complete relation r.
  */
object Missing {

  /** One injected missing cell: the query tuple (full row), which attribute
    * is missing, and the ground truth that was removed.
    */
  final case class Query(row: Array[Double], attr: Int, truth: Double)

  /** An imputation problem: complete relation + queries with known truth. */
  final case class Problem(complete: Array[Array[Double]], queries: Array[Query]) {
    /** Queries grouped by missing attribute (imputed "one by one", §II). */
    def byAttr: Map[Int, Array[Query]] = queries.groupBy(_.attr)
  }

  /** Remove one attribute value from `frac` of the tuples. `attr = -1` picks
    * a random attribute per tuple (Table V); a fixed attr reproduces
    * Table VI's per-attribute rows.
    */
  def inject(rows: Array[Array[Double]], frac: Double, seed: Long, attr: Int = -1,
             count: Int = -1): Problem = {
    val rnd = new Random(seed)
    val n = rows.length
    val m = rows(0).length
    val nMissing = if (count > 0) math.min(count, n - 1) else math.max(1, (n * frac).toInt)
    val chosen = rnd.shuffle((0 until n).toList).take(nMissing).toSet
    val complete = new scala.collection.mutable.ArrayBuffer[Array[Double]](n)
    val queries = new scala.collection.mutable.ArrayBuffer[Query](nMissing)
    var i = 0
    while (i < n) {
      if (chosen(i)) {
        val a = if (attr >= 0) attr else rnd.nextInt(m)
        queries += Query(rows(i), a, rows(i)(a))
      } else complete += rows(i)
      i += 1
    }
    Problem(complete.toArray, queries.toArray)
  }

  /** MCAR cell-level injection for the application experiments (Table VII):
    * each tuple independently loses each attribute with probability
    * `cellProb`; lost cells become NaN. Returns the NaN-holed copy.
    */
  def injectCells(rows: Array[Array[Double]], cellProb: Double, seed: Long): Array[Array[Double]] = {
    val rnd = new Random(seed)
    rows.map { r =>
      val c = r.clone()
      var a = 0
      var missing = 0
      while (a < c.length) {
        // Keep at least one observed attribute per tuple.
        if (missing < c.length - 1 && rnd.nextDouble() < cellProb) { c(a) = Double.NaN; missing += 1 }
        a += 1
      }
      c
    }
  }
}
