package repro.baselines

import repro.core.{Imputer, Neighbors}
import repro.ml.Gbt

/** XGB baseline: gradient-boosted regression trees from F to the target,
  * trained on the complete relation (the paper uses the R `xgboost` package;
  * [[repro.ml.Gbt]] is a from-scratch equivalent with the same objective).
  */
final class XgbImputer(rounds: Int = 40, depth: Int = 3, lr: Double = 0.2,
                       lambda: Double = 1.0) extends Imputer {
  override val name = "XGB"
  override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                         queries: Array[Array[Double]], seed: Long): Array[Double] = {
    val xs = complete.map(r => Neighbors.project(r, featIdx))
    val ys = complete.map(_(targetIdx))
    val model = Gbt.train(xs, ys, rounds, depth, lr, lambda)
    queries.map(model.predict)
  }
}
