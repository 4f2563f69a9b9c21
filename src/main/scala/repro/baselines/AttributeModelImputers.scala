package repro.baselines

import repro.core.{Imputer, Neighbors, Ridge}
import repro.linalg.LinAlg
import scala.util.Random

/** Attribute-model baselines of Table II: GLR, LOESS, BLR, ERACER, PMM. */

/** Global linear (ridge) regression from F to the target (Formulas 3–4). */
final class GlrImputer(alpha: Double = 1e-3) extends Imputer {
  override val name = "GLR"
  override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                         queries: Array[Array[Double]], seed: Long): Array[Double] = {
    val phi = GlrImputer.fit(complete, featIdx, targetIdx, alpha)
    queries.map(q => Ridge.predict(phi, q))
  }
}

object GlrImputer {
  def fit(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int, alpha: Double): Array[Double] =
    Ridge.fit(complete.map(r => Neighbors.project(r, featIdx)), complete.map(_(targetIdx)), alpha)
}

/** Local regression (Cleveland & Loader): tricube-weighted ridge over the k
  * nearest neighbours of the query, learned online per incomplete tuple.
  */
final class LoessImputer(span: Int = 30, alpha: Double = 1e-3) extends Imputer {
  override val name = "LOESS"
  override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                         queries: Array[Array[Double]], seed: Long): Array[Double] = {
    val k = math.min(math.max(span, 2 * featIdx.length + 2), complete.length)
    queries.map { q =>
      val nn = Neighbors.nearest(complete, featIdx, q, k)
      val d = nn.map(i => Neighbors.distance(complete(i), featIdx, q))
      val dMax = math.max(d.last, 1e-12)
      val w = d.map { di => val t = math.min(di / dMax, 1.0); math.pow(1.0 - t * t * t, 3) }
      // Guard: if every weight vanishes (all neighbours at dMax), fall back to uniform.
      val ws = if (w.forall(_ <= 1e-12)) Array.fill(w.length)(1.0) else w
      val xs = nn.map(i => Neighbors.project(complete(i), featIdx))
      val ys = nn.map(i => complete(i)(targetIdx))
      Ridge.predict(Ridge.fitWeighted(xs, ys, ws, alpha), q)
    }
  }
}

/** Bayesian linear regression à la mice.norm: fit ridge, draw φ* from the
  * posterior N(φ, σ²(XᵀX+αI)⁻¹) and add observation noise to the prediction.
  */
final class BlrImputer(alpha: Double = 1e-3) extends Imputer {
  override val name = "BLR"
  override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                         queries: Array[Array[Double]], seed: Long): Array[Double] = {
    val rnd = new Random(seed)
    val xs = complete.map(r => Neighbors.project(r, featIdx))
    val ys = complete.map(_(targetIdx))
    val phi = Ridge.fit(xs, ys, alpha)
    val n = xs.length; val p = featIdx.length + 1
    val rss = xs.indices.map { i => val e = ys(i) - Ridge.predict(phi, xs(i)); e * e }.sum
    val sigma2 = math.max(rss / math.max(n - p, 1), 1e-12)
    // Posterior covariance σ²(XᵀX+αI)⁻¹ via its Cholesky-solved columns.
    val st = new Ridge.State(featIdx.length, alpha)
    xs.indices.foreach(i => st.add(xs(i), ys(i)))
    val a = LinAlg.copy(st.u)
    (0 until p).foreach(i => a(i)(i) += alpha)
    val cov = LinAlg.zeros(p, p)
    (0 until p).foreach { j =>
      val e = new Array[Double](p); e(j) = 1.0
      val colSol = LinAlg.solve(a, e)
      (0 until p).foreach(i => cov(i)(j) = sigma2 * colSol(i))
    }
    // Symmetrise tiny asymmetries before the Cholesky.
    (0 until p).foreach(i => (0 until p).foreach { j =>
      val s = (cov(i)(j) + cov(j)(i)) / 2.0; cov(i)(j) = s; cov(j)(i) = s
    })
    (0 until p).foreach(i => cov(i)(i) += 1e-12)
    val l = LinAlg.cholesky(cov)
    queries.map { q =>
      val z = Array.fill(p)(rnd.nextGaussian())
      val draw = Array.tabulate(p)(i => phi(i) + LinAlg.dot(l(i), z))
      Ridge.predict(draw, q) + math.sqrt(sigma2) * rnd.nextGaussian()
    }
  }
}

/** ERACER (Mayfield et al.): regression on both the tuple's own complete
  * attributes and its neighbours' aggregated attributes, applied iteratively.
  */
final class EracerImputer(k: Int = 5, alpha: Double = 1e-3, iters: Int = 2) extends Imputer {
  override val name = "ERACER"
  override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                         queries: Array[Array[Double]], seed: Long): Array[Double] = {
    val m = complete(0).length
    // Training features: own F values + mean of the k neighbours' full tuples.
    def extend(q: Array[Double], exclude: Int): Array[Double] = {
      val nn = Neighbors.nearest(complete, featIdx, q, k, exclude)
      val agg = new Array[Double](m)
      nn.foreach { i => var a = 0; while (a < m) { agg(a) += complete(i)(a) / nn.length; a += 1 } }
      q ++ agg
    }
    val xs = complete.indices.map { i =>
      extend(Neighbors.project(complete(i), featIdx), i)
    }.toArray
    val ys = complete.map(_(targetIdx))
    var phi = Ridge.fit(xs, ys, alpha)
    var preds = queries.map(q => Ridge.predict(phi, extend(q, -1)))
    // One refinement pass: re-fit is unchanged (training set is complete), but
    // iterate predictions to mirror ERACER's relaxation loop.
    var it = 1
    while (it < iters) {
      preds = queries.map(q => Ridge.predict(phi, extend(q, -1)))
      it += 1
    }
    preds
  }
}

/** Predictive mean matching (Landerman et al. / mice.pmm): regress, then
  * return the observed value of a random donor among the `donors` complete
  * tuples whose fitted values are closest to the query's prediction.
  */
final class PmmImputer(donors: Int = 5, alpha: Double = 1e-3) extends Imputer {
  override val name = "PMM"
  override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                         queries: Array[Array[Double]], seed: Long): Array[Double] = {
    val rnd = new Random(seed)
    val phi = GlrImputer.fit(complete, featIdx, targetIdx, alpha)
    val fitted = complete.map(r => Ridge.predict(phi, Neighbors.project(r, featIdx)))
    queries.map { q =>
      val yHat = Ridge.predict(phi, q)
      val pool = fitted.indices.sortBy(i => (math.abs(fitted(i) - yHat), i)).take(donors)
      complete(pool(rnd.nextInt(pool.length)))(targetIdx)
    }
  }
}
