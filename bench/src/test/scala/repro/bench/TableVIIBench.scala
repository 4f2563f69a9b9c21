package repro.bench

import repro.SparkSpec
import repro.tables.TableVII

/** Full-size reproduction of Table VII (clustering purity on ASF & CA,
  * classification F1 on MAM & HEP, with vs without imputation).
  */
class TableVIIBench extends SparkSpec {

  private lazy val clustering = TableVII.clustering(spark, sizeFactor = 1.0, seed = 42)
  private lazy val classification = TableVII.classification(spark, sizeFactor = 1.0, seed = 42)

  test("Table VII: print reproduced table") {
    println("=== Table VII: clustering purity / classification F1 (reproduction) ===")
    println(TableVII.format(clustering ++ classification))
  }

  test("Table VII shape: imputation with IIM beats no imputation on clustering") {
    clustering.foreach { r =>
      assert(r.scores("IIM") >= r.missing - 0.02,
        s"${r.dataset}: IIM=${r.scores("IIM")} missing=${r.missing}")
    }
  }

  test("Table VII shape: IIM is at or near the top on clustering purity") {
    clustering.foreach { r =>
      val best = r.scores.values.max
      assert(r.scores("IIM") >= best - 0.08, s"${r.dataset}: IIM=${r.scores("IIM")} best=$best")
    }
  }

  test("Table VII shape: classification F1 with IIM imputation is competitive") {
    classification.foreach { r =>
      val best = r.scores.values.max
      assert(r.scores("IIM") >= best - 0.06, s"${r.dataset}: IIM=${r.scores("IIM")} best=$best")
      assert(r.scores("IIM") >= r.missing - 0.05)
    }
  }

  test("Table VII: all scores are valid proportions") {
    (clustering ++ classification).foreach { r =>
      (r.missing +: r.scores.values.toSeq).foreach(v => assert(v >= 0.0 && v <= 1.0))
    }
  }
}
