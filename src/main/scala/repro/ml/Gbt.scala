package repro.ml

/** Gradient-boosted regression trees with the xgboost split objective —
  * substrate of the XGB baseline (the paper uses the R `xgboost` package).
  *
  * Squared loss, so per-row gradient g = ŷ−y and hessian h = 1; split gain is
  * ½[G_L²/(H_L+λ) + G_R²/(H_R+λ) − G²/(H+λ)] and leaf weight −G/(H+λ), as in
  * Chen & Guestrin 2016. Trees are grown level-wise with exact greedy splits
  * over globally pre-sorted feature columns (one O(n) scan per feature per
  * level), so training is O(rounds · depth · m · n) after an O(m·n log n)
  * presort.
  */
object Gbt {

  /** Flattened binary tree: node 0 is the root; children of i are 2i+1/2i+2.
    * `feat(i) == -1` marks a leaf with value `value(i)`.
    */
  final case class Tree(feat: Array[Int], thr: Array[Double], value: Array[Double]) {
    def predict(x: Array[Double]): Double = {
      var i = 0
      while (feat(i) >= 0) i = if (x(feat(i)) < thr(i)) 2 * i + 1 else 2 * i + 2
      value(i)
    }
  }

  final case class Model(base: Double, trees: Array[Tree], lr: Double) {
    def predict(x: Array[Double]): Double = {
      var s = base; var t = 0
      while (t < trees.length) { s += lr * trees(t).predict(x); t += 1 }
      s
    }
  }

  def train(xs: Array[Array[Double]], ys: Array[Double], rounds: Int = 40, depth: Int = 3,
            lr: Double = 0.2, lambda: Double = 1.0, minChild: Int = 5): Model = {
    require(xs.nonEmpty, "cannot train on zero rows")
    val n = xs.length; val m = xs(0).length
    val base = ys.sum / n
    val pred = Array.fill(n)(base)
    // Global presort per feature (indices sorted by feature value).
    val sorted = Array.tabulate(m)(f => Array.range(0, n).sortBy(i => xs(i)(f)))
    val trees = new Array[Tree](rounds)
    val maxNodes = (1 << (depth + 1)) - 1
    var round = 0
    while (round < rounds) {
      val g = Array.tabulate(n)(i => pred(i) - ys(i)) // gradient of ½(ŷ−y)²
      val nodeOf = new Array[Int](n)                  // current leaf of each row
      val feat = Array.fill(maxNodes)(-1)
      val thr = new Array[Double](maxNodes)
      val value = new Array[Double](maxNodes)
      var levelStart = 0; var levelCount = 1
      var d = 0
      while (d < depth) {
        // Totals per node at this level.
        val gTot = new Array[Double](maxNodes)
        val hTot = new Array[Double](maxNodes)
        var i = 0
        while (i < n) { gTot(nodeOf(i)) += g(i); hTot(nodeOf(i)) += 1.0; i += 1 }
        val bestGain = Array.fill(maxNodes)(1e-12)
        val bestFeat = Array.fill(maxNodes)(-1)
        val bestThr = new Array[Double](maxNodes)
        var f = 0
        while (f < m) {
          val gl = new Array[Double](maxNodes)
          val hl = new Array[Double](maxNodes)
          val lastV = new Array[Double](maxNodes)
          val seen = new Array[Boolean](maxNodes)
          val col = sorted(f)
          var p = 0
          while (p < n) {
            val row = col(p)
            val nd = nodeOf(row)
            if (nd >= levelStart && nd < levelStart + levelCount && feat(nd) == -1) {
              val v = xs(row)(f)
              // Candidate split between the previous and current distinct value.
              if (seen(nd) && v > lastV(nd) && hl(nd) >= minChild && hTot(nd) - hl(nd) >= minChild) {
                val gL = gl(nd); val hL = hl(nd)
                val gR = gTot(nd) - gL; val hR = hTot(nd) - hL
                val gain = gL * gL / (hL + lambda) + gR * gR / (hR + lambda) -
                  gTot(nd) * gTot(nd) / (hTot(nd) + lambda)
                if (gain > bestGain(nd)) {
                  bestGain(nd) = gain; bestFeat(nd) = f; bestThr(nd) = (v + lastV(nd)) / 2.0
                }
              }
              gl(nd) += g(row); hl(nd) += 1.0
              lastV(nd) = v; seen(nd) = true
            }
            p += 1
          }
          f += 1
        }
        // Materialise the level's splits.
        var nd = levelStart
        var anySplit = false
        while (nd < levelStart + levelCount) {
          if (bestFeat(nd) >= 0) { feat(nd) = bestFeat(nd); thr(nd) = bestThr(nd); anySplit = true }
          nd += 1
        }
        i = 0
        while (i < n) {
          val cur = nodeOf(i)
          if (feat(cur) >= 0) nodeOf(i) = if (xs(i)(feat(cur)) < thr(cur)) 2 * cur + 1 else 2 * cur + 2
          i += 1
        }
        levelStart = 2 * levelStart + 1
        levelCount *= 2
        d = if (anySplit) d + 1 else depth
      }
      // Leaf values: −G/(H+λ) over rows ending at each node.
      val gLeaf = new Array[Double](maxNodes)
      val hLeaf = new Array[Double](maxNodes)
      var i = 0
      while (i < n) { gLeaf(nodeOf(i)) += g(i); hLeaf(nodeOf(i)) += 1.0; i += 1 }
      var ndI = 0
      while (ndI < maxNodes) {
        if (feat(ndI) == -1 && hLeaf(ndI) > 0) value(ndI) = -gLeaf(ndI) / (hLeaf(ndI) + lambda)
        ndI += 1
      }
      val tree = Tree(feat, thr, value)
      i = 0
      while (i < n) { pred(i) += lr * tree.predict(xs(i)); i += 1 }
      trees(round) = tree
      round += 1
    }
    Model(base, trees, lr)
  }
}
