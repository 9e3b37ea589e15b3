package repro.core

import repro.{PaperExample, SparkSpec}
import repro.baseline.BruteForce
import repro.mobility.{ImModel, ImParams, TraceGen}
import repro.spindex.SpIndex

/** Algorithm 2 (§4): the Example 4.1 walk, exactness against brute force
  * across datasets × measures × k, and Theorem 4.1 upper-bound validity.
  */
class TopKSpec extends SparkSpec {

  private def paperSetup: (TraceStore, TopKSearcher) = {
    val pe = PaperExample
    val store = TraceStore.fromLocal(pe.traces, pe.sp)
    val sigs = pe.traces.map { case (e, cs) => e -> Signatures.computeLocal(cs, pe.sp, pe.hasher) }
    val tree = MinSigTree.fromLocal(sigs, pe.sp, nh = 2)
    (store, new TopKSearcher(tree, store, pe.hasher, pe.measure41))
  }

  test("Example 4.1: top-1 for e_c is e_a with degree 0.5") {
    val (_, searcher) = paperSetup
    val r = searcher.search(PaperExample.eC, 1)
    assert(r.hits.map(_._1) == Seq(PaperExample.eA))
    assert(math.abs(r.hits.head._2 - 0.5) < 1e-12)
  }

  test("Example 4.1: pruning never scores e_b; at most e_a and e_d are checked") {
    // With the paper's sig_d^2 typo corrected (see PaperExample), e_d's
    // branch carries no level-2 pruning information, so it may be checked
    // in addition to e_a — but N22={e_b} is pruned to UB=0.1 < 0.5 and is
    // never scored.
    val (_, searcher) = paperSetup
    val r = searcher.search(PaperExample.eC, 1)
    assert(r.checked <= 2, s"checked ${r.checked} entities, expected at most {e_a, e_d}")
  }

  test("Example 4.1: searching from every entity returns exact brute-force top-1") {
    val (store, searcher) = paperSetup
    PaperExample.traces.keys.foreach { q =>
      val expected = BruteForce.topK(store, PaperExample.measure41, q, 1)
      val got = searcher.search(q, 1)
      assert(got.hits.map(_._2) == expected.map(_._2), s"query $q")
    }
  }

  /** Random-dataset harness: build everything driver-side. */
  private def randomSetup(
      nEntities: Int,
      nh: Int,
      seed: Long,
      measure: SpIndex => Measure,
      side: Int = 16,
      m: Int = 3,
      horizon: Int = 40,
  ): (TraceStore, TopKSearcher, Measure) = {
    val sp = SpIndex.build(side, m, 2.0, 1.0)
    val traces = (0L until nEntities.toLong)
      .map(e => e -> ImModel.simulate(e, side, ImParams(horizon = horizon), seed))
      .toMap
    val store = TraceStore.fromLocal(traces, sp)
    val h = new AdditiveHasher(sp, nh, seed + 13)
    val sigs = traces.map { case (e, cs) => e -> Signatures.computeLocal(cs, sp, h) }
    val tree = MinSigTree.fromLocal(sigs, sp, nh)
    val d = measure(sp)
    (store, new TopKSearcher(tree, store, h, d), d)
  }

  // Exactness: the top-k *degree multiset* must equal brute force's (entity
  // sets may differ under ties; any tie-respecting answer is a valid top-k).
  private def assertExact(store: TraceStore, searcher: TopKSearcher, d: Measure, q: Long, k: Int): Unit = {
    val expected = BruteForce.topK(store, d, q, k).map(_._2)
    val got = searcher.search(q, k)
    assert(got.hits.size == expected.size, s"q=$q k=$k sizes")
    got.hits.map(_._2).zip(expected).zipWithIndex.foreach { case ((g, e), i) =>
      assert(math.abs(g - e) < 1e-9, s"q=$q k=$k rank $i: got $g expected $e")
    }
  }

  private val measureFactories: Seq[(String, SpIndex => Measure)] = Seq(
    "ADM(1,1)" -> (sp => AdmMeasure(sp.m, 1, 1)),
    "ADM(2,0.5)" -> (sp => AdmMeasure(sp.m, 2, 0.5)),
    "ADM(0.5,2)" -> (sp => AdmMeasure(sp.m, 0.5, 2)),
    "Jaccard" -> (sp => JaccardMeasure(sp.m)),
    "Cosine" -> (sp => CosineMeasure(sp.m)),
  )

  for ((name, mf) <- measureFactories; seed <- Seq(101L, 202L)) {
    test(s"exactness vs brute force [$name, seed=$seed] for k in {1, 5, 20}") {
      val (store, searcher, d) = randomSetup(150, 8, seed, mf)
      val queries = store.entities.toSeq.sorted.take(8)
      for (q <- queries; k <- Seq(1, 5, 20))
        assertExact(store, searcher, d, q, k)
    }
  }

  test("exactness with very few hash functions (nh=2, weak pruning still exact)") {
    val (store, searcher, d) = randomSetup(100, 2, 303, sp => AdmMeasure(sp.m, 1, 1))
    store.entities.toSeq.sorted.take(6).foreach(q => assertExact(store, searcher, d, q, 3))
  }

  test("exactness with many hash functions (nh=64)") {
    val (store, searcher, d) = randomSetup(100, 64, 304, sp => AdmMeasure(sp.m, 1, 1))
    store.entities.toSeq.sorted.take(6).foreach(q => assertExact(store, searcher, d, q, 3))
  }

  test("exactness on a single-level hierarchy (m=1)") {
    val (store, searcher, d) = randomSetup(80, 8, 305, sp => AdmMeasure(sp.m, 1, 1), m = 1)
    store.entities.toSeq.sorted.take(5).foreach(q => assertExact(store, searcher, d, q, 4))
  }

  test("exactness on a deep hierarchy (m=4) with the REAL-surrogate generator") {
    val sp = SpIndex.build(16, 4, 2.0, 2.0)
    val cells = TraceGen.realLike(spark, 16, 120, horizon = 60, seed = 5)
    val store = TraceStore.fromCells(spark, cells, sp)
    val h = new AdditiveHasher(sp, 16, 44)
    val tree = MinSigTree.fromCells(spark, cells, sp, h)
    val d = AdmMeasure(sp.m, 1, 1)
    val searcher = new TopKSearcher(tree, store, h, d)
    store.entities.toSeq.sorted.take(6).foreach(q => assertExact(store, searcher, d, q, 5))
  }

  test("k larger than the candidate set returns everything ranked") {
    val (store, searcher, d) = randomSetup(10, 4, 306, sp => AdmMeasure(sp.m, 1, 1))
    val r = searcher.search(0L, 50)
    assert(r.hits.size == 9)
    assert(r.hits.map(_._2).sorted.reverse == r.hits.map(_._2))
  }

  test("query entity is never part of its own answer") {
    val (store, searcher, _) = randomSetup(50, 8, 307, sp => AdmMeasure(sp.m, 1, 1))
    store.entities.toSeq.sorted.take(10).foreach { q =>
      assert(!searcher.search(q, 5).hits.exists(_._1 == q))
    }
  }

  test("searching an unknown entity throws") {
    val (_, searcher, _) = randomSetup(10, 4, 308, sp => AdmMeasure(sp.m, 1, 1))
    intercept[IllegalArgumentException](searcher.search(9999L, 1))
  }

  test("Theorem 4.1: every leaf upper bound dominates its members' true degrees") {
    val (store, searcher, d) = randomSetup(120, 8, 309, sp => AdmMeasure(sp.m, 1, 1))
    val sp = store.sp
    for (q <- store.entities.toSeq.sorted.take(5)) {
      val ctx = QueryContext(store, searcher.hasher, d, q)
      def walk(n: SigNode, masks: Array[Array[Boolean]], ub: Double): Unit = {
        if (n.isLeaf) {
          n.entities.filter(_ != q).foreach { e =>
            val actual = store.degree(d, e, q)
            assert(ub >= actual - 1e-9, s"q=$q leaf member $e: ub=$ub actual=$actual")
          }
        } else n.children.valuesIterator.foreach { c =>
          val m2 = ctx.pruneMasks(masks, c, searcher.tree.pruneCoords)
          walk(c, m2, math.min(ub, ctx.upperBound(m2)))
        }
      }
      walk(searcher.tree.root, ctx.freshMasks(), 1.0)
      assert(sp.m >= 1)
    }
  }

  test("upper bounds tighten monotonically down every path (Theorem 3.3 corollary)") {
    val (store, searcher, d) = randomSetup(120, 8, 310, sp => AdmMeasure(sp.m, 1, 1))
    val q = store.entities.toSeq.min
    val ctx = QueryContext(store, searcher.hasher, d, q)
    def walk(n: SigNode, masks: Array[Array[Boolean]], parentUb: Double): Unit = {
      n.children.valuesIterator.foreach { c =>
        val m2 = ctx.pruneMasks(masks, c, searcher.tree.pruneCoords)
        val ub = ctx.upperBound(m2)
        assert(ub <= parentUb + 1e-12)
        walk(c, m2, math.min(parentUb, ub))
      }
    }
    walk(searcher.tree.root, ctx.freshMasks(), 1.0)
  }

  test("exactness is preserved after incremental updates (§3.2.3)") {
    val (store0, searcher0, d) = randomSetup(100, 8, 311, sp => AdmMeasure(sp.m, 1, 1))
    val sp = store0.sp
    val tree = searcher0.tree
    val h = searcher0.hasher
    // Re-simulate 30 entities with new traces and update both store & tree.
    val updated = (0L until 30L).map { e =>
      e -> ImModel.simulate(e + 5000, 16, ImParams(horizon = 40), 312)
    }.toMap
    val newData = store0.data ++ updated.map { case (e, cs) => e -> Cells.rollup(cs, sp) }
    val store = new TraceStore(sp, newData)
    updated.foreach { case (e, cs) => tree.update(e, Signatures.computeLocal(cs, sp, h)) }
    // Also insert brand-new entities.
    val fresh = (1000L until 1010L).map { e =>
      e -> ImModel.simulate(e, 16, ImParams(horizon = 40), 313)
    }.toMap
    val store2 = new TraceStore(sp, store.data ++ fresh.map { case (e, cs) => e -> Cells.rollup(cs, sp) })
    fresh.foreach { case (e, cs) => tree.insert(e, Signatures.computeLocal(cs, sp, h)) }
    val searcher = new TopKSearcher(tree, store2, h, d)
    store2.entities.toSeq.sorted.take(8).foreach(q => assertExact(store2, searcher, d, q, 5))
  }

  test("checked count is bounded by |E|-1 and PE is within [0, 1]") {
    val (store, searcher, _) = randomSetup(60, 8, 314, sp => AdmMeasure(sp.m, 1, 1))
    val n = store.entities.size
    store.entities.toSeq.sorted.take(10).foreach { q =>
      val r = searcher.search(q, 5)
      assert(r.checked <= n - 1)
      val pe = r.pe(n)
      assert(pe >= 0.0 && pe <= 1.0)
    }
  }
}
