package repro.tables

import repro.SparkSpec

/** Small-scale smoke runs of every table harness; the full-size runs live in
  * the bench project (one suite per table).
  */
class TablesSmokeSpec extends SparkSpec {

  test("TableIII: incremental learning is exact and at least as fast") {
    val r = TableIII.run(n = 300, lMax = 120, step = 2)
    assert(r.identical, "incremental and from-scratch candidate models must agree bitwise")
    assert(r.speedup > 1.0, s"speedup=${r.speedup}")
  }

  test("TableV smoke: all methods produce finite RMS on every dataset") {
    val rows = TableV.run(spark, sizeFactor = 0.04, seed = 7)
    assert(rows.map(_.dataset) == TableV.datasets)
    rows.foreach { r =>
      assert(r.rms.nonEmpty)
      r.rms.foreach { case (m, v) => assert(!v.isNaN && !v.isInfinite && v >= 0.0, s"${r.dataset}/$m") }
      assert(r.rms.contains("IIM"))
    }
  }

  test("TableV smoke: SN row skips SVD/ILLS/XGB as in the paper") {
    val rows = TableV.run(spark, sizeFactor = 0.04, seed = 8)
    val sn = rows.find(_.dataset == "SN").get
    assert(Methods.skippedOnSn.forall(m => !sn.rms.contains(m)))
  }

  test("TableV formatting renders one line per dataset plus a header") {
    val rows = TableV.run(spark, sizeFactor = 0.04, seed = 9)
    val text = TableV.format(rows)
    assert(text.linesIterator.size == rows.size + 1)
    assert(text.contains("IIM") && text.contains("R2_S"))
  }

  test("TableVI smoke: one row per ASF attribute, all finite") {
    val rows = TableVI.run(spark, sizeFactor = 0.15, seed = 10)
    assert(rows.map(_.attr) == (0 until 6))
    rows.foreach(r => r.rms.values.foreach(v => assert(!v.isNaN && !v.isInfinite)))
  }

  test("TableVII clustering smoke: scores in [0,1] and IIM present") {
    val rows = TableVII.clustering(spark, sizeFactor = 0.12, seed = 11)
    assert(rows.map(_.dataset) == Seq("ASF", "CA"))
    rows.foreach { r =>
      assert(r.missing >= 0.0 && r.missing <= 1.0)
      assert(r.scores.contains("IIM") && r.scores.contains("Mean"))
      r.scores.values.foreach(v => assert(v >= 0.0 && v <= 1.0))
    }
  }

  test("TableVII classification smoke: scores in [0,1]") {
    val rows = TableVII.classification(spark, sizeFactor = 0.25, seed = 12)
    assert(rows.map(_.dataset) == Seq("MAM", "HEP"))
    rows.foreach(r => r.scores.values.foreach(v => assert(v >= 0.0 && v <= 1.0)))
  }

  test("Methods roster matches the paper's Table II comparison set") {
    val names = Methods.baselines().map(_.name)
    assert(names == Seq("kNN", "kNNE", "IFC", "GMM", "SVD", "ILLS", "GLR", "LOESS", "BLR", "ERACER", "PMM", "XGB"))
    assert(Methods.withMean().head.name == "Mean")
  }

  test("per-dataset IIM params use wider stepping on the big datasets") {
    assert(Methods.iimParams("SN").step > Methods.iimParams("ASF").step)
  }
}
