package repro.bench

import repro.SparkSpec
import repro.tables.TableVI

/** Full-size reproduction of Table VI (per-attribute RMS on ASF, 100
  * incomplete tuples per attribute).
  */
class TableVIBench extends SparkSpec {

  private lazy val rows = TableVI.run(spark, sizeFactor = 1.0, seed = 42)

  test("Table VI: print reproduced table") {
    println("=== Table VI: RMS per incomplete attribute, ASF (reproduction) ===")
    println(TableVI.format(rows))
  }

  test("Table VI shape: IIM never worse than both special cases on any attribute") {
    rows.foreach { r =>
      val iim = r.rms("IIM")
      assert(iim <= math.min(r.rms("kNN"), r.rms("GLR")) * 1.08,
        s"A${r.attr + 1}: IIM=$iim kNN=${r.rms("kNN")} GLR=${r.rms("GLR")}")
    }
  }

  test("Table VI shape: IIM is within 15% of the best method on most attributes") {
    val wins = rows.count(r => r.rms("IIM") <= r.rms.values.min * 1.15)
    assert(wins >= 4, s"IIM near-best on only $wins/6 attributes")
  }

  test("Table VI shape: RMS scale differs across attributes (domain ranges)") {
    val iims = rows.map(_.rms("IIM"))
    assert(iims.max > iims.min * 2, "attribute scales should spread the RMS values")
  }
}
