package repro.tables

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core.{IIM, Imputer}
import repro.spark.SparkIIM

/** The paper's method roster (Table II) in the column order of Tables V–VII. */
object Methods {

  /** Per-dataset IIM parameters (lMax/step bound the adaptive sweep; see
    * DESIGN.md §5 — the paper itself uses stepping, h=50 in Fig. 12).
    */
  def iimParams(datasetName: String): IIM.Params = datasetName match {
    case "SN"             => IIM.Params(k = 5, lMax = 60, step = 5, kv = 20)
    case "CCPP" | "PHASE" => IIM.Params(k = 5, lMax = 200, step = 8, kv = 20)
    case "CA"             => IIM.Params(k = 5, lMax = 160, step = 6, kv = 20)
    case _                => IIM.Params(k = 5, lMax = 120, step = 4, kv = 20)
  }

  /** IIM through the Spark path (used by every table harness). */
  def iim(spark: SparkSession, dataset: String): Imputer =
    new SparkIIM.SparkImputer(spark, iimParams(dataset))

  /** The 13 comparison methods of Table II, in Table V column order. */
  def baselines(): Seq[Imputer] = Seq(
    new KnnImputer(5),
    new KnnEImputer(5),
    new IfcImputer(4),
    new GmmImputer(4),
    new SvdImputer(),
    new IllsImputer(),
    new GlrImputer(),
    new LoessImputer(),
    new BlrImputer(),
    new EracerImputer(),
    new PmmImputer(),
    new XgbImputer(),
  )

  /** Methods the paper reports as "-" on SN (not implementable on 2 attrs). */
  val skippedOnSn: Set[String] = Set("SVD", "ILLS", "XGB")

  /** Table VII roster: Mean joins the list, right after IIM. */
  def withMean(): Seq[Imputer] = new MeanImputer() +: baselines()
}
