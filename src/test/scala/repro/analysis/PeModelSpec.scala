package repro.analysis

import org.scalatest.funsuite.AnyFunSuite

/** The analytical PE model (§5.3, Eqs. 16–19). */
class PeModelSpec extends AnyFunSuite {

  test("pMinGe is a valid survival function in i") {
    val r = 1000; val len = 20
    assert(PeModel.pMinGe(r, len, 0) == 1.0)
    assert(PeModel.pMinGe(r, len, r) == 0.0)
    val vals = (0 to r by 50).map(PeModel.pMinGe(r, len, _))
    assert(vals.zip(vals.tail).forall { case (a, b) => a >= b })
  }

  test("minCdf is a valid CDF: increasing from ~0 to 1") {
    val r = 1000; val len = 20
    val vals = (0 to r by 50).map(PeModel.minCdf(r, len, _))
    assert(vals.zip(vals.tail).forall { case (a, b) => a <= b })
    assert(math.abs(vals.last - 1.0) < 1e-12)
  }

  test("the min-value distribution integrates to 1") {
    val r = 500; val len = 10
    val total = (0 until r).map(i => PeModel.pMinGe(r, len, i) - PeModel.pMinGe(r, len, i + 1)).sum
    assert(math.abs(total - 1.0) < 1e-9)
  }

  test("longer traces push the signature minimum lower") {
    val r = 1000
    // P(min <= 100) grows with trace length.
    assert(PeModel.minCdf(r, 5, 100) < PeModel.minCdf(r, 50, 100))
  }

  test("routedCdf (max over n_h) stochastically dominates the single-hash CDF") {
    val r = 1000; val len = 20
    for (i <- Seq(100, 300, 700))
      assert(PeModel.routedCdf(r, len, 16, i) <= PeModel.minCdf(r, len, i))
  }

  test("binomTailGe matches direct computation on small cases") {
    // X ~ Bin(4, 0.5): P(X >= 2) = 11/16.
    assert(math.abs(PeModel.binomTailGe(4, 0.5, 2) - 11.0 / 16) < 1e-9)
    assert(PeModel.binomTailGe(4, 0.5, 0) == 1.0)
    assert(PeModel.binomTailGe(4, 0.0, 1) == 0.0)
    assert(PeModel.binomTailGe(4, 1.0, 4) == 1.0)
    assert(PeModel.binomTailGe(4, 1.0, 5) == 0.0)
  }

  test("binomTailGe is monotone in p and anti-monotone in nc") {
    assert(PeModel.binomTailGe(20, 0.3, 5) < PeModel.binomTailGe(20, 0.6, 5))
    assert(PeModel.binomTailGe(20, 0.5, 10) < PeModel.binomTailGe(20, 0.5, 5))
  }

  test("predicted PE is within [0, 1]") {
    for (nh <- Seq(2, 16, 128, 1024)) {
      val pe = PeModel.predictPe(rangeR = 8192, len = 100, nh = nh, nc = 5)
      assert(pe >= 0.0 && pe <= 1.0, s"nh=$nh pe=$pe")
    }
  }

  test("predicted PE decreases as n_h grows (the Figure 2 trend)") {
    val pes = Seq(2, 8, 32, 128, 512).map(nh =>
      PeModel.predictPe(rangeR = 8192, len = 100, nh = nh, nc = 5))
    assert(pes.zip(pes.tail).forall { case (a, b) => a >= b - 1e-9 }, pes.mkString(","))
  }

  test("predicted PE decreases as the required overlap n_c grows") {
    val loose = PeModel.predictPe(rangeR = 8192, len = 100, nh = 64, nc = 2)
    val tight = PeModel.predictPe(rangeR = 8192, len = 100, nh = 64, nc = 20)
    assert(tight <= loose)
  }

  test("ncFromDegree inverts the ADM approximation sensibly") {
    // Full similarity (d_e = 1) needs ~2*len shared cells under the
    // symmetric approximation; zero degree needs at least one.
    val len = 100
    assert(PeModel.ncFromDegree(1.0, len, m = 4, u = 1, v = 1) >= len)
    assert(PeModel.ncFromDegree(1e-6, len, m = 4, u = 1, v = 1) >= 1)
    // Monotone in d_e.
    val lo = PeModel.ncFromDegree(0.1, len, 4, 1, 1)
    val hi = PeModel.ncFromDegree(0.5, len, 4, 1, 1)
    assert(hi >= lo)
  }

  test("predictPe validates its arguments") {
    intercept[IllegalArgumentException](PeModel.predictPe(1, 10, 4, 1))
    intercept[IllegalArgumentException](PeModel.predictPe(100, 0, 4, 1))
  }

  test("survivalProb is in (0,1], decreasing in coords and n_h, increasing in len") {
    val s = PeModel.survivalProb(40, 256, 64)
    assert(s > 0.0 && s <= 1.0)
    assert(PeModel.survivalProb(40, 256, 64) < PeModel.survivalProb(40, 256, 8))
    assert(PeModel.survivalProb(40, 1024, 64) < PeModel.survivalProb(40, 64, 64))
    assert(PeModel.survivalProb(200, 256, 64) > PeModel.survivalProb(20, 256, 64))
  }

  test("survivalProb caps coords at n_h") {
    assert(PeModel.survivalProb(10, 4, 64) == PeModel.survivalProb(10, 4, 4))
  }

  test("predictPeSampled: full-overlap candidates always survive, disjoint ones rarely") {
    val shared = Seq((40, 40))
    val disjoint = Seq((40, 0))
    assert(PeModel.predictPeSampled(40, 1024, 64, 10, shared) == 1.0)
    assert(PeModel.predictPeSampled(40, 1024, 64, 10, disjoint) < 0.01)
  }

  test("predictPeSampled decreases with n_h (the Figure 2 trend)") {
    val pairs = (0 until 50).map(i => (20 + i, i % 8))
    val pes = Seq(8, 64, 512).map(nh => PeModel.predictPeSampled(40, nh, 64, 5, pairs))
    assert(pes.zip(pes.tail).forall { case (a, b) => a >= b - 1e-12 }, pes.mkString(","))
  }

  test("predictPeSampled rejects empty samples") {
    intercept[IllegalArgumentException](PeModel.predictPeSampled(10, 8, 4, 2, Nil))
  }
}
