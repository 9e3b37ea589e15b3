package repro.analysis

import org.scalatest.funsuite.AnyFunSuite

/** Kendall's tau (Eq. 22), K_avg (Eq. 21), ADDiff, and PE (Def. 5.1). */
class MetricsSpec extends AnyFunSuite {

  test("kendallTau of identical lists is 0") {
    assert(Metrics.kendallTau(Seq(1, 2, 3, 4), Seq(1, 2, 3, 4)) == 0.0)
  }

  test("kendallTau of reversed lists is 1") {
    assert(Metrics.kendallTau(Seq(1, 2, 3, 4), Seq(4, 3, 2, 1)) == 1.0)
  }

  test("kendallTau of a single swap of adjacent elements") {
    // One discordant pair out of C(4,2)=6.
    val d = Metrics.kendallTau(Seq(1, 2, 3, 4), Seq(2, 1, 3, 4))
    assert(math.abs(d - 1.0 / 6) < 1e-12)
  }

  test("kendallTau is symmetric") {
    val a = Seq(3, 1, 4, 2, 5)
    val b = Seq(1, 5, 2, 4, 3)
    assert(Metrics.kendallTau(a, b) == Metrics.kendallTau(b, a))
  }

  test("kendallTau requires equal element sets") {
    intercept[IllegalArgumentException](Metrics.kendallTau(Seq(1, 2), Seq(1, 3)))
  }

  test("kendallTau of singleton and empty lists is 0") {
    assert(Metrics.kendallTau(Seq(1), Seq(1)) == 0.0)
    assert(Metrics.kendallTau(Seq.empty[Int], Seq.empty[Int]) == 0.0)
  }

  test("kAvg of identical top-k lists is 0") {
    assert(Metrics.kAvg(Seq("a", "b", "c"), Seq("a", "b", "c")) == 0.0)
  }

  test("kAvg of disjoint top-k lists is large") {
    // Fully disjoint lists: every cross pair is discordant after padding.
    val d = Metrics.kAvg(Seq(1, 2), Seq(3, 4))
    assert(d > 0.5)
  }

  test("kAvg handles partially overlapping lists") {
    val d = Metrics.kAvg(Seq(1, 2, 3), Seq(2, 1, 4))
    assert(d > 0.0 && d < 1.0)
  }

  test("adDiff of identical score lists is 0") {
    assert(Metrics.adDiff(Seq(0.5, 0.3), Seq(0.5, 0.3)) == 0.0)
  }

  test("adDiff is the mean absolute difference") {
    assert(math.abs(Metrics.adDiff(Seq(0.5, 0.3), Seq(0.4, 0.1)) - 0.15) < 1e-12)
  }

  test("adDiff rejects mismatched lengths") {
    intercept[IllegalArgumentException](Metrics.adDiff(Seq(0.1), Seq(0.1, 0.2)))
  }

  test("pe follows Definition 5.1 and clamps at 0") {
    assert(Metrics.pe(checked = 110, k = 10, nEntities = 1000) == 0.1)
    assert(Metrics.pe(checked = 5, k = 10, nEntities = 1000) == 0.0)
    assert(Metrics.pe(checked = 1000, k = 0, nEntities = 1000) == 1.0)
  }
}
