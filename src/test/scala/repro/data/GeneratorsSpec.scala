package repro.data

import org.scalatest.funsuite.AnyFunSuite

class GeneratorsSpec extends AnyFunSuite {

  test("every preset dataset has the designed shape") {
    val expected = Map(
      "ASF" -> (1500, 6), "CCS" -> (1000, 6), "CCPP" -> (4000, 5), "SN" -> (20000, 2),
      "PHASE" -> (4000, 4), "CA" -> (6000, 9), "DA" -> (3000, 6), "MAM" -> (1000, 5), "HEP" -> (200, 19),
    )
    for ((name, (n, m)) <- expected) {
      val ds = Generators.byName(name)
      assert(ds.n == n && ds.m == m, s"$name: got ${ds.n}x${ds.m}")
    }
  }

  test("generation is deterministic in the seed") {
    val a = Generators.byName("ASF", seed = 7)
    val b = Generators.byName("ASF", seed = 7)
    assert(a.rows.flatten[Double].sameElements(b.rows.flatten[Double]))
  }

  test("different seeds give different data") {
    val a = Generators.byName("CCS", seed = 1)
    val b = Generators.byName("CCS", seed = 2)
    assert(!a.rows.flatten[Double].sameElements(b.rows.flatten[Double]))
  }

  test("sizeFactor scales the row count") {
    val ds = Generators.byName("CCPP", sizeFactor = 0.1)
    assert(ds.n == 400)
  }

  test("sizeFactor never drops below the floor") {
    val ds = Generators.byName("CCS", sizeFactor = 0.001)
    assert(ds.n == 64)
  }

  test("labelled presets carry labels aligned with rows") {
    for (name <- Seq("ASF", "CA", "MAM", "HEP")) {
      val ds = Generators.byName(name)
      assert(ds.labels.isDefined && ds.labels.get.length == ds.n, name)
    }
  }

  test("unlabelled presets carry no labels") {
    for (name <- Seq("CCS", "CCPP", "SN", "PHASE", "DA"))
      assert(Generators.byName(name).labels.isEmpty, name)
  }

  test("MAM and HEP have two classes (binary classification, §VI-D2)") {
    for (name <- Seq("MAM", "HEP"))
      assert(Generators.byName(name).labels.get.distinct.sorted.sameElements(Array(0, 1)), name)
  }

  test("no NaN or infinite values are generated") {
    for (name <- Seq("ASF", "SN", "CA", "HEP"))
      assert(Generators.byName(name, sizeFactor = 0.2).rows.flatten.forall(v => !v.isNaN && !v.isInfinite))
  }

  test("unknown dataset name is rejected") {
    assertThrows[IllegalArgumentException](Generators.byName("NOPE"))
  }

  test("mixtureLinear rejects mis-sized attrScale") {
    assertThrows[IllegalArgumentException](
      Generators.mixtureLinear("x", 10, 3, 1, 1, 1.0, 1.0, 0.5, 0.1, Array(1.0), 0L))
  }

  test("piecewise2d produces x in [0,10] and 2 columns") {
    val ds = Generators.piecewise2d("x", 500, 10, 0.05, 3L)
    assert(ds.rows.forall(r => r.length == 2 && r(0) >= 0.0 && r(0) <= 10.0))
  }

  test("paper regimes hold: PHASE is globally regressive, SN is not (R²_H)") {
    val phase = Generators.byName("PHASE", sizeFactor = 0.25)
    val sn = Generators.byName("SN", sizeFactor = 0.05)
    val pPhase = Missing.inject(phase.rows, 0.05, seed = 1)
    val pSn = Missing.inject(sn.rows, 0.05, seed = 1)
    val (_, r2hPhase) = Quality.r2Avg(pPhase)
    val (_, r2hSn) = Quality.r2Avg(pSn)
    assert(r2hPhase > 0.8, s"PHASE r2h=$r2hPhase")
    assert(r2hSn < 0.5, s"SN r2h=$r2hSn")
  }

  test("paper regimes hold: CA is sparse (low R²_S), SN is not") {
    val ca = Generators.byName("CA", sizeFactor = 0.25)
    val sn = Generators.byName("SN", sizeFactor = 0.05)
    val (r2sCa, _) = Quality.r2Avg(Missing.inject(ca.rows, 0.05, seed = 2))
    val (r2sSn, _) = Quality.r2Avg(Missing.inject(sn.rows, 0.05, seed = 2))
    assert(r2sSn > r2sCa, s"SN r2s=$r2sSn should exceed CA r2s=$r2sCa")
  }
}
