package repro.data

import scala.util.Random

/** Synthetic equivalents of the paper's 9 evaluation datasets (Table IV).
  *
  * The real data (UCI / KEEL / Siemens) is unreachable from this sealed
  * container, so each dataset is synthesised as a seeded mixture of local
  * linear manifolds: every cluster c has an affine map from a latent z to
  * the m attributes plus Gaussian noise,
  *
  *   row = center_c + B_c · z + scale ⊙ ε,   B_c = B₀ + jitter·D_c.
  *
  * The knobs reproduce Table IV's property column and the R²_S / R²_H
  * regimes of Table V:
  *
  *  - `latentDim` drives **sparsity**: high-dimensional latents curse
  *    nearest-neighbour distances, so neighbour values decorrelate from the
  *    truth (low R²_S) while regression stays exact;
  *  - `basisJitter`/`clusters` drive **heterogeneity**: distinct per-cluster
  *    maps break any single global regression (low R²_H);
  *  - `noise` sets the irreducible imputation floor — kept well below the
  *    kNN interpolation error wherever the paper reports a large IIM-vs-kNN
  *    gap.
  *
  * See DESIGN.md §3 for the per-dataset mapping.
  */
object Generators {

  /** A generated dataset: rows (n×m) and optional class labels (Table VII). */
  final case class Dataset(name: String, rows: Array[Array[Double]], labels: Option[Array[Int]] = None) {
    def n: Int = rows.length
    def m: Int = rows(0).length
  }

  /** Mixture-of-affine-manifolds generator (see object doc).
    *
    * @param basisJitter 0 ⇒ all clusters share one affine map (globally
    *                    linear data); 1 ⇒ fully distinct maps (heterogeneous)
    */
  def mixtureLinear(name: String, n: Int, m: Int, clusters: Int, latentDim: Int,
                    centerSpread: Double, slopeScale: Double, basisJitter: Double,
                    noise: Double, attrScale: Array[Double], seed: Long,
                    labelled: Boolean = false, centersInLatent: Boolean = false): Dataset = {
    require(attrScale.length == m, s"attrScale must have $m entries")
    val rnd = new Random(seed)
    val baseB = Array.fill(m, latentDim)((rnd.nextDouble() * 2 - 1) * slopeScale)
    val bases = Array.fill(clusters, m, latentDim)((rnd.nextDouble() * 2 - 1) * slopeScale)
      .map(bc => Array.tabulate(m, latentDim)((a, d) => baseB(a)(d) + basisJitter * bc(a)(d)))
    // centersInLatent places cluster centres ON the shared manifold
    // (μ_c = B_c · z_c), keeping the data globally linear yet clusterable —
    // the CA regime needs both at once.
    val centers: Array[Array[Double]] =
      if (centersInLatent) {
        val zc = Array.fill(clusters, latentDim)((rnd.nextDouble() * 2 - 1) * centerSpread)
        Array.tabulate(clusters, m) { (c, a) =>
          var v = 0.0; var d = 0
          while (d < latentDim) { v += bases(c)(a)(d) * zc(c)(d); d += 1 }
          v
        }
      } else Array.fill(clusters, m)((rnd.nextDouble() * 2 - 1) * centerSpread)
    val rows = new Array[Array[Double]](n)
    val labels = new Array[Int](n)
    var i = 0
    while (i < n) {
      val c = rnd.nextInt(clusters)
      labels(i) = c
      val z = Array.fill(latentDim)(rnd.nextDouble() * 2 - 1)
      val row = new Array[Double](m)
      var a = 0
      while (a < m) {
        var v = centers(c)(a)
        var d = 0
        while (d < latentDim) { v += bases(c)(a)(d) * z(d); d += 1 }
        row(a) = (v + rnd.nextGaussian() * noise) * attrScale(a)
        a += 1
      }
      rows(i) = row
      i += 1
    }
    Dataset(name, rows, if (labelled) Some(labels) else None)
  }

  /** Piecewise-linear 2-attribute curve whose segment offsets are i.i.d. —
    * the SN regime: locally linear (kNN and local models work) with no
    * global regression whatsoever (R²_H ≈ 0).
    */
  def piecewise2d(name: String, n: Int, segments: Int, noise: Double, seed: Long): Dataset = {
    val rnd = new Random(seed)
    val slopes = Array.fill(segments)((rnd.nextDouble() * 2 - 1) * 3.0)
    val offsets = Array.fill(segments)((rnd.nextDouble() * 2 - 1) * 4.0)
    val segLen = 10.0 / segments
    val rows = Array.fill(n) {
      val x = rnd.nextDouble() * 10.0
      val s = math.min((x / segLen).toInt, segments - 1)
      val y = offsets(s) + slopes(s) * (x - s * segLen) + rnd.nextGaussian() * noise
      Array(x, y)
    }
    Dataset(name, rows)
  }

  /** Paper dataset presets, scaled (sizeFactor=1.0 ⇒ DESIGN.md §3 sizes). */
  def byName(name: String, seed: Long = 42, sizeFactor: Double = 1.0): Dataset = {
    def sz(n: Int): Int = math.max(64, (n * sizeFactor).toInt)
    name match {
      case "ASF" => // heterogeneous: 4 clusters, distinct local regressions,
        // 3-D latent sparsity so neighbour values visibly miss the truth
        mixtureLinear("ASF", sz(1500), 6, clusters = 4, latentDim = 3,
          centerSpread = 4.0, slopeScale = 2.0, basisJitter = 1.0, noise = 0.12,
          attrScale = Array(60.0, 8.0, 1.5, 5.0, 20.0, 1.2), seed = seed, labelled = true)
      case "CCS" => // noisy mid-heterogeneity
        mixtureLinear("CCS", sz(1000), 6, clusters = 3, latentDim = 3,
          centerSpread = 3.5, slopeScale = 1.5, basisJitter = 0.8, noise = 0.3,
          attrScale = Array(12.0, 10.0, 8.0, 10.0, 9.0, 11.0), seed = seed)
      case "CCPP" => // dense, near-global regression with mild cluster drift
        mixtureLinear("CCPP", sz(4000), 5, clusters = 2, latentDim = 3,
          centerSpread = 0.8, slopeScale = 2.0, basisJitter = 0.35, noise = 0.08,
          attrScale = Array(5.0, 4.0, 6.0, 5.0, 5.0), seed = seed)
      case "SN" => // 2 attributes, many segments: kNN good, GLR hopeless
        piecewise2d("SN", sz(20000), segments = 24, noise = 0.03, seed = seed)
      case "PHASE" => // one clear global regression (three-phase power)
        mixtureLinear("PHASE", sz(4000), 4, clusters = 1, latentDim = 2,
          centerSpread = 0.0, slopeScale = 2.5, basisJitter = 0.0, noise = 0.15,
          attrScale = Array(10.0, 10.0, 10.0, 10.0), seed = seed)
      case "CA" => // sparse high dimension: full-rank latent (8 = m−1) curses
        // neighbour distances (low R²_S); a *mildly* jittered shared map keeps
        // one near-global regression (high R²_H) yet leaves room for
        // individual models to beat it. Latent clusters make it clusterable
        // for the Table VII application.
        mixtureLinear("CA", sz(6000), 9, clusters = 3, latentDim = 8,
          centerSpread = 1.5, slopeScale = 3.0, basisJitter = 0.06, noise = 0.05,
          attrScale = Array.fill(9)(1.0), seed = seed, labelled = true,
          centersInLatent = true)
      case "DA" => // mid regime
        mixtureLinear("DA", sz(3000), 6, clusters = 3, latentDim = 3,
          centerSpread = 4.5, slopeScale = 2.0, basisJitter = 0.8, noise = 0.25,
          attrScale = Array(15.0, 12.0, 14.0, 13.0, 15.0, 12.0), seed = seed)
      case "MAM" => // labelled, overlapping classes, for classification
        mixtureLinear("MAM", sz(1000), 5, clusters = 2, latentDim = 2,
          centerSpread = 1.2, slopeScale = 1.2, basisJitter = 0.5, noise = 0.4,
          attrScale = Array(4.0, 5.0, 4.0, 5.0, 4.0), seed = seed, labelled = true)
      case "HEP" => // labelled, tiny n, high m, strong class overlap
        mixtureLinear("HEP", sz(200), 19, clusters = 2, latentDim = 3,
          centerSpread = 0.8, slopeScale = 1.0, basisJitter = 0.5, noise = 0.8,
          attrScale = Array.fill(19)(3.0), seed = seed, labelled = true)
      case other => throw new IllegalArgumentException(s"unknown dataset $other")
    }
  }
}
