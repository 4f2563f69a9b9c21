package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{IIM, Imputer, Neighbors}
import repro.linalg.LinAlg.Vec

/** Spark-parallel IIM, per the DataFrame-first layering in DESIGN.md §1.
  *
  * The complete relation is small (≤100k short rows) and is broadcast; the
  * two heavy loops of adaptive learning fan out over the cluster:
  *
  *  - candidate-model learning is `mapPartitions` over one row per complete
  *    tuple (`spark.range(n)`), each task running the incremental
  *    Proposition-3 update for its tuples;
  *  - validation fans out per validation tuple, emitting (i, ℓ, cost)
  *    contributions that a DataFrame `groupBy().sum()` aggregates — the
  *    shuffle path, since broadcast joins are disabled in tests;
  *  - imputation (Algorithm 2) is a scalar UDF over the feature array,
  *    applied only where the target column is NULL/NaN.
  */
object SparkIIM {

  /** Distributed Algorithm-3 learning; returns one model per complete tuple
    * (identical to [[IIM.adaptive]] — asserted in tests).
    */
  def adaptiveModels(spark: SparkSession, data: Array[Array[Double]], featIdx: Array[Int],
                     targetIdx: Int, p: IIM.Params): Array[Vec] = {
    import spark.implicits._
    val sc = spark.sparkContext
    val n = data.length
    val ls = IIM.ellCandidates(n, p.lMax, p.step)
    val limit = math.max(ls.last, p.kvEff + 1)
    val bcData = sc.broadcast(data)
    val bcFeat = sc.broadcast(featIdx)
    val kv = p.kvEff
    val alpha = p.alpha
    val tIdx = targetIdx

    // Phase A: per-tuple candidate models, parallel over tuples.
    val modelRows = spark.range(n.toLong).as[Long].mapPartitions { it =>
      val d = bcData.value; val fi = bcFeat.value
      it.map { iL =>
        val i = iL.toInt
        val list = Neighbors.nearest(d, fi, Neighbors.project(d(i), fi), math.min(limit, d.length))
        val models = IIM.candidateModelsFor(d, fi, tIdx, list, ls, alpha)
        (i, models.map(_.toSeq).toSeq)
      }
    }.collect()
    val models = new Array[Array[Vec]](n)
    modelRows.foreach { case (i, ms) => models(i) = ms.map(_.toArray).toArray }

    // Phase B: validation-cost contributions per validation tuple, aggregated
    // relationally. cost[i][li] = Σ_j (v_j − φ_i^{(ℓ_li)}(t_j[F]))² over the
    // validation tuples j that count i among their k imputation neighbours.
    val bcModels = sc.broadcast(models)
    val contributions = spark.range(n.toLong).as[Long].flatMap { jL =>
      val d = bcData.value; val fi = bcFeat.value; val ms = bcModels.value
      val j = jL.toInt
      val xF = Neighbors.project(d(j), fi)
      val v = d(j)(tIdx)
      val nn = Neighbors.nearest(d, fi, xF, kv, exclude = j)
      for {
        i <- nn.toSeq
        li <- ls.indices
      } yield {
        val e = v - repro.core.Ridge.predict(ms(i)(li), xF)
        (i, li, e * e)
      }
    }.toDF("i", "li", "err")
      .groupBy("i", "li").agg(sum("err").as("cost"))
      .collect()

    val cost = Array.fill(n)(new Array[Double](ls.length))
    contributions.foreach(r => cost(r.getInt(0))(r.getInt(1)) = r.getDouble(2))
    IIM.selectModels(models, cost)
  }

  /** Algorithm 2 as a DataFrame UDF: rows of `df` whose `targetCol` is
    * NULL/NaN are imputed from the broadcast complete relation and models.
    * `featCols` must be in the same order as `featIdx` used at learning time.
    */
  def impute(spark: SparkSession, df: DataFrame, featCols: Seq[String], targetCol: String,
             complete: Array[Array[Double]], featIdx: Array[Int], models: Array[Vec],
             k: Int): DataFrame = {
    val sc = spark.sparkContext
    val bcData = sc.broadcast(complete)
    val bcModels = sc.broadcast(models)
    val bcFeat = sc.broadcast(featIdx)
    val imputeUdf = udf { (xs: Seq[Double]) =>
      IIM.imputeOne(bcData.value, bcModels.value, bcFeat.value, xs.toArray, k)
    }
    val target = col(targetCol)
    df.withColumn(
      targetCol,
      when(target.isNull || isnan(target), imputeUdf(array(featCols.map(col): _*)))
        .otherwise(target))
  }

  /** End-to-end convenience: learn on `complete`, impute the projected
    * queries through the DataFrame path, return values in query order.
    */
  def imputeValues(spark: SparkSession, complete: Array[Array[Double]], featIdx: Array[Int],
                   targetIdx: Int, queries: Array[Array[Double]], p: IIM.Params): Array[Double] = {
    import spark.implicits._
    val models = adaptiveModels(spark, complete, featIdx, targetIdx, p)
    val featCols = featIdx.indices.map(a => s"f$a")
    val qDf = spark.createDataset(queries.zipWithIndex.map { case (q, id) => (id, q.toSeq) })
      .toDF("id", "fs")
      .select(col("id") +: featCols.zipWithIndex.map { case (c, a) => col("fs").getItem(a).as(c) }: _*)
      .withColumn("y", lit(Double.NaN))
    val out = impute(spark, qDf, featCols, "y", complete, featIdx, models, p.k)
      .select("id", "y").collect()
    val res = new Array[Double](queries.length)
    out.foreach(r => res(r.getInt(0)) = r.getDouble(1))
    res
  }

  /** [[Imputer]] adapter that runs IIM through the Spark path. */
  final class SparkImputer(spark: SparkSession, p: IIM.Params) extends Imputer {
    override def name: String = "IIM"
    override def imputeAll(complete: Array[Array[Double]], featIdx: Array[Int], targetIdx: Int,
                           queries: Array[Array[Double]], seed: Long): Array[Double] =
      imputeValues(spark, complete, featIdx, targetIdx, queries, p)
  }
}
