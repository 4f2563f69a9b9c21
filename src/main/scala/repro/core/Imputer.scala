package repro.core

/** A batch numerical-imputation method (one column at a time, as in the
  * paper: "multiple incomplete attributes … addressed one by one").
  */
trait Imputer {
  /** Column name used in the reproduced tables (matches the paper's header). */
  def name: String

  /** Impute the target attribute for every query.
    *
    * @param complete  the relation r of fully complete tuples (full rows)
    * @param featIdx   indices of the complete attributes F within a row
    * @param targetIdx index of the incomplete attribute A_m within a row
    * @param queries   projected feature vectors (featIdx order) of the
    *                  incomplete tuples
    * @param seed      seed for methods with randomised steps (BLR, PMM, …)
    * @return one imputed value per query
    */
  def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                queries: Array[Array[Double]], seed: Long): Array[Double]
}
