package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.spindex.SpIndex

/** The hash-family constraint of §3.2.1 and Theorem 3.1. */
class HashingSpec extends AnyFunSuite {

  private val sp = SpIndex.build(16, 4, 2.0, 2.0)
  private val h = new AdditiveHasher(sp, nh = 8, seed = 5)

  test("hash values are deterministic and within [0, range)") {
    for (u <- 0 until h.nh; t <- Seq(0, 7, 100); loc <- Seq(0, 31, 255)) {
      val v = h.base(sp, u, t, loc)
      assert(v == h.base(sp, u, t, loc))
      assert(v >= 0 && v < h.range, s"u=$u t=$t loc=$loc v=$v range=${h.range}")
    }
  }

  test("parent-min constraint holds exactly at every level (§3.2.1)") {
    // h_u(t, unit at level l) == min over level-(l+1) children of h_u.
    for (l <- 1 until sp.m; u <- 0 until h.nh; t <- Seq(3, 9)) {
      val childrenByParent = (0 until sp.nBase).groupBy(sp.ancestor(l, _))
      childrenByParent.foreach { case (unit, locs) =>
        val childUnits = locs.map(sp.ancestor(l + 1, _)).distinct
        val minChild = childUnits.map(c => h.unit(u, l + 1, t, c)).min
        assert(h.unit(u, l, t, unit) == minChild, s"l=$l u=$u unit=$unit")
      }
    }
  }

  test("Theorem 3.1: sig_e^i[u] <= sig_e^{i+1}[u] for simulated entities") {
    for (e <- 0L until 10L) {
      val cells = repro.mobility.ImModel.simulate(e, 16, repro.mobility.ImParams(horizon = 50), seed = 2)
      val sig = Signatures.computeLocal(cells, sp, h)
      for (l <- 0 until sp.m - 1; u <- 0 until h.nh)
        assert(sig(l * h.nh + u) <= sig((l + 1) * h.nh + u), s"e=$e l=${l + 1} u=$u")
    }
  }

  test("different hash functions give different values (family is not degenerate)") {
    val values = (0 until h.nh).map(u => h.base(sp, u, 5, 77))
    assert(values.distinct.size > 1)
  }

  test("updateMins matches the generic trait implementation") {
    val generic = new CellHasher {
      val nh = h.nh
      val range = h.range
      def unit(u: Int, level: Int, t: Int, unitId: Int): Int = h.unit(u, level, t, unitId)
    }
    val cells = Array((3, 17), (9, 200), (3, 17), (40, 5))
    val a = Array.fill(sp.m * h.nh)(Int.MaxValue)
    val b = Array.fill(sp.m * h.nh)(Int.MaxValue)
    cells.foreach { case (t, loc) => h.updateMins(sp, t, loc, a) }
    cells.foreach { case (t, loc) => generic.updateMins(sp, t, loc, b) }
    assert(a.toSeq == b.toSeq)
  }

  test("hashers with different seeds disagree") {
    val h2 = new AdditiveHasher(sp, nh = 8, seed = 6)
    val same = (0 until 8).count(u => h.base(sp, u, 1, 1) == h2.base(sp, u, 1, 1))
    assert(same < 8)
  }

  test("paper Example 3.2 table hasher satisfies the parent-min constraint") {
    val pe = repro.PaperExample
    // h1(T1 L5) = min(h1(T1L1), h1(T1L2)) = min(2, 5) = 2, etc.
    assert(pe.hasher.unit(0, 1, 0, pe.sp.ancestor(1, 0)) == 2)
    assert(pe.hasher.unit(0, 1, 1, pe.sp.ancestor(1, 0)) == 1)
    assert(pe.hasher.unit(1, 1, 0, pe.sp.ancestor(1, 0)) == 6)
    assert(pe.hasher.unit(1, 1, 1, pe.sp.ancestor(1, 0)) == 3)
  }

  test("mixInt is uniform-ish over its range") {
    val n = 20000
    val mod = 64
    val counts = new Array[Int](mod)
    (0 until n).foreach(i => counts(AdditiveHasher.mixInt(123L, i, i * 7, mod)) += 1)
    val expected = n / mod
    assert(counts.forall(c => c > expected / 2 && c < expected * 2), counts.mkString(","))
  }
}
