package repro.data

import repro.baselines.{GlrImputer, KnnImputer}
import repro.ml.Metrics

/** The paper's data-property measures (§VI-A2): R²_S quantifies sparsity
  * (how well complete neighbours' values predict the truth — low means
  * sparse) and R²_H heterogeneity (how well a single global regression
  * predicts the truth — low means heterogeneous).
  */
object Quality {

  /** (R²_S, R²_H) for an injected problem on one attribute. */
  def r2(problem: Missing.Problem, attr: Int, k: Int = 5): (Double, Double) = {
    val qs = problem.queries.filter(_.attr == attr)
    require(qs.nonEmpty, s"no queries on attribute $attr")
    val m = problem.complete(0).length
    val featIdx = (0 until m).filter(_ != attr).toArray
    val feats = qs.map(q => featIdx.map(q.row))
    val truth = qs.map(_.truth)
    val knn = new KnnImputer(k).imputeAll(problem.complete, featIdx, attr, feats, 0L)
    val glr = new GlrImputer().imputeAll(problem.complete, featIdx, attr, feats, 0L)
    (Metrics.r2(truth, knn), Metrics.r2(truth, glr))
  }

  /** Query-count-weighted average (R²_S, R²_H) over all injected attributes. */
  def r2Avg(problem: Missing.Problem, k: Int = 5): (Double, Double) = {
    val groups = problem.byAttr.toSeq.sortBy(_._1)
    val weighted = groups.map { case (attr, qs) => (qs.length, r2(problem, attr, k)) }
    val total = weighted.map(_._1).sum.toDouble
    (weighted.map { case (w, (s, _)) => w * s }.sum / total,
     weighted.map { case (w, (_, h)) => w * h }.sum / total)
  }
}
