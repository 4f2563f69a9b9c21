package repro.baselines

import repro.core.{Imputer, Neighbors}
import repro.ml.{FuzzyCMeans, Gmm}

/** Cluster-average baselines of Table II: IFC (fuzzy c-means) and GMM. */

/** Iterative fuzzy clustering (Nikfalazar et al.): fuzzy c-means on the
  * complete attributes, impute as the membership-weighted mean of the target
  * over cluster members.
  */
final class IfcImputer(c: Int = 4, fuzzifier: Double = 2.0) extends Imputer {
  override val name = "IFC"
  override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                         queries: Array[Array[Double]], seed: Long): Array[Double] = {
    val feats = complete.map(r => Neighbors.project(r, featIdx))
    val model = FuzzyCMeans.fit(feats, math.min(c, complete.length), seed, fuzzifier)
    // Per-cluster fuzzy mean of the target attribute.
    val num = new Array[Double](model.centroids.length)
    val den = new Array[Double](model.centroids.length)
    var i = 0
    while (i < complete.length) {
      var j = 0
      while (j < num.length) {
        val w = math.pow(model.membership(i)(j), fuzzifier)
        num(j) += w * complete(i)(targetIdx); den(j) += w
        j += 1
      }
      i += 1
    }
    val clusterMean = Array.tabulate(num.length)(j => if (den(j) > 0) num(j) / den(j) else 0.0)
    queries.map { q =>
      val u = FuzzyCMeans.membershipOf(model, q, fuzzifier)
      var s = 0.0; var j = 0
      while (j < u.length) { s += u(j) * clusterMean(j); j += 1 }
      s
    }
  }
}

/** Gaussian-mixture imputation (Yan et al.): posterior-weighted component
  * means of the target, with the posterior computed from the observed
  * attributes only.
  */
final class GmmImputer(c: Int = 4, iters: Int = 30) extends Imputer {
  override val name = "GMM"
  override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                         queries: Array[Array[Double]], seed: Long): Array[Double] = {
    val model = Gmm.fit(complete, math.min(c, complete.length), seed, iters)
    queries.map { q =>
      val lp = Array.tabulate(model.weights.length) { j =>
        math.log(model.weights(j)) + Gmm.logDensity(q, model.means(j), model.variances(j), featIdx)
      }
      val mx = lp.max
      val w = lp.map(v => math.exp(v - mx))
      val s = w.sum
      var acc = 0.0; var j = 0
      while (j < w.length) { acc += w(j) / s * model.means(j)(targetIdx); j += 1 }
      acc
    }
  }
}
