package repro.core

import repro.{PaperExample, SparkSpec}
import repro.mobility.{ImModel, ImParams}
import repro.spindex.SpIndex

/** Signature computation (§3.2.1): the paper's worked Example 3.2 verbatim,
  * Theorems 3.1/3.2, and driver/Spark path agreement.
  */
class SignaturesSpec extends SparkSpec {

  test("Example 3.2: the signature table is reproduced verbatim") {
    val pe = PaperExample
    pe.traces.foreach { case (e, cells) =>
      val sig = Signatures.computeLocal(cells, pe.sp, pe.hasher)
      assert(sig.toSeq == pe.expectedSigs(e).toSeq, s"entity $e")
    }
  }

  test("Example 3.2 routing: e_a,e_b,e_c route to group 2, e_d to group 1") {
    val pe = PaperExample
    def route(e: Long) =
      Signatures.routing(Signatures.computeLocal(pe.traces(e), pe.sp, pe.hasher), 2, 2)._1(0)
    assert(route(pe.eA) == 1) // 0-based: second hash function
    assert(route(pe.eB) == 1)
    assert(route(pe.eC) == 1)
    assert(route(pe.eD) == 0)
  }

  test("routing picks the per-level argmax with ties to the lowest index") {
    val sig = Array(3, 7, 7, 1, /* level 2 */ 9, 2, 9, 9)
    val (idx, value) = Signatures.routing(sig, m = 2, nh = 4)
    assert(idx.toSeq == Seq(1, 0))
    assert(value.toSeq == Seq(7, 9))
  }

  test("Theorem 3.2: a cell hashing below the signature is provably absent") {
    val sp = SpIndex.build(16, 3, 2.0, 1.0)
    val h = new AdditiveHasher(sp, nh = 16, seed = 9)
    val cells = ImModel.simulate(4L, 16, ImParams(horizon = 60), seed = 1)
    val present = cells.map { case (t, loc) => Cells.encode(t, loc) }.toSet
    val sig = Signatures.computeLocal(cells, sp, h)
    // For every candidate cell in a sample: if some sig_e^i[u] > h_u(s),
    // then s must not be present (contrapositive check on real data).
    for (t <- 0 until 60; loc <- 0 until 256 by 7) {
      val pruned = (0 until sp.m).exists { li =>
        (0 until h.nh).exists(u => sig(li * h.nh + u) > h.base(sp, u, t, loc))
      }
      if (pruned) assert(!present.contains(Cells.encode(t, loc)), s"t=$t loc=$loc")
    }
  }

  test("signature of a superset trace is element-wise <= the subset's") {
    val sp = SpIndex.build(16, 2, 1.0, 1.0)
    val h = new AdditiveHasher(sp, nh = 8, seed = 3)
    val small = Array((1, 5), (2, 9))
    val large = small ++ Array((3, 100), (7, 200))
    val sigS = Signatures.computeLocal(small, sp, h)
    val sigL = Signatures.computeLocal(large, sp, h)
    assert(sigS.indices.forall(i => sigL(i) <= sigS(i)))
  }

  test("identical traces produce identical signatures") {
    val sp = SpIndex.build(8, 2, 1.0, 1.0)
    val h = new AdditiveHasher(sp, nh = 4, seed = 1)
    val a = Signatures.computeLocal(Array((0, 1), (5, 3)), sp, h)
    val b = Signatures.computeLocal(Array((5, 3), (0, 1)), sp, h)
    assert(a.toSeq == b.toSeq)
  }

  test("Spark path agrees with driver path on generated data") {
    import spark.implicits._
    val sp = SpIndex.build(16, 3, 2.0, 1.0)
    val h = new AdditiveHasher(sp, nh = 8, seed = 4)
    val local = (0L until 25L).map(e => e -> ImModel.simulate(e, 16, ImParams(horizon = 40), seed = 6)).toMap
    val df = local.toSeq
      .flatMap { case (e, cs) => cs.map { case (t, loc) => (e, t, loc) } }
      .toDF("entity", "t", "loc")
    val sparkSigs = Signatures.compute(spark, df, sp, h).collect().map(es => es.entity -> es.sig).toMap
    assert(sparkSigs.keySet == local.keySet)
    local.foreach { case (e, cs) =>
      assert(sparkSigs(e).toSeq == Signatures.computeLocal(cs, sp, h).toSeq, s"entity $e")
    }
  }

  test("entities with empty traces produce no signature rows in Spark") {
    import spark.implicits._
    val sp = SpIndex.build(8, 2, 1.0, 1.0)
    val h = new AdditiveHasher(sp, nh = 4, seed = 2)
    val df = Seq((1L, 0, 0), (3L, 1, 2)).toDF("entity", "t", "loc")
    val sigs = Signatures.compute(spark, df, sp, h).collect()
    assert(sigs.map(_.entity).toSet == Set(1L, 3L))
  }
}
