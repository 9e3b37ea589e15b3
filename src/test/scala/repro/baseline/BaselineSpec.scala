package repro.baseline

import repro.SparkSpec
import repro.core._
import repro.mobility.TraceGen
import repro.spindex.SpIndex

/** The §6.2 cluster/bitmap baseline: exactness (it prunes, but must never
  * lose an answer) and its structural properties.
  */
class BaselineSpec extends SparkSpec {

  private def setup(nEntities: Int, seed: Long, nClusters: Int = 16) = {
    val sp = SpIndex.build(16, 3, 2.0, 1.0)
    val cells = TraceGen.syn(spark, 16, nEntities, repro.mobility.ImParams(horizon = 40), seed)
    val store = TraceStore.fromCells(spark, cells, sp)
    val idx = ClusterBitmap.build(spark, cells, sp, nClusters = nClusters, minSupport = 2)
    val d = AdmMeasure(sp.m, 1, 1)
    (sp, store, idx, d)
  }

  test("bitmap groups cover every entity exactly once") {
    val (_, store, idx, _) = setup(60, 501)
    val all = idx.groups.flatMap(_._2)
    assert(all.size == store.entities.size)
    assert(all.toSet == store.entities.toSet)
  }

  test("entity vectors have a set bit for every level of every owned cell") {
    val (sp, store, idx, _) = setup(40, 502)
    idx.groups.foreach { case (words, es) =>
      es.take(3).foreach { e =>
        for (l <- 1 to sp.m; cell <- store.levelCells(e, l)) {
          val bit = idx.bitOf(l, idx.clusterOf(l, cell))
          assert(idx.bitSet(words, bit), s"entity $e level $l cell $cell")
        }
      }
    }
  }

  test("baseline search is exact: degree sequence matches brute force") {
    val (_, store, idx, d) = setup(80, 503)
    for (q <- Seq(0L, 5L, 17L, 33L); k <- Seq(1, 5, 10)) {
      val expected = BruteForce.topK(store, d, q, k).map(_._2)
      val got = ClusterBitmap.search(idx, store, d, q, k).hits.map(_._2)
      assert(got.size == expected.size, s"q=$q k=$k")
      got.zip(expected).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9, s"q=$q k=$k") }
    }
  }

  test("baseline never returns the query entity") {
    val (_, store, idx, d) = setup(40, 504)
    store.entities.toSeq.sorted.take(8).foreach { q =>
      assert(!ClusterBitmap.search(idx, store, d, q, 5).hits.exists(_._1 == q))
    }
  }

  test("baseline and MinSigTree both prune while staying exact") {
    // The paper's §6.7 claim (baseline checks far more than MinSigTree) is
    // asserted at bench scale in Fig6ResultSizeBench; at unit scale with
    // 150 entities either can win by luck, so only sanity is checked here.
    val sp = SpIndex.build(16, 3, 2.0, 1.0)
    val cells = TraceGen.syn(spark, 16, 150, repro.mobility.ImParams(horizon = 40), 505)
    val store = TraceStore.fromCells(spark, cells, sp)
    val d = AdmMeasure(sp.m, 1, 1)
    val h = new AdditiveHasher(sp, 32, 506)
    val tree = MinSigTree.fromCells(spark, cells, sp, h)
    val searcher = new TopKSearcher(tree, store, h, d)
    val idx = ClusterBitmap.build(spark, cells, sp, nClusters = 16, minSupport = 2)
    val queries = store.entities.toSeq.sorted.take(10)
    val n = store.entities.size
    queries.foreach { q =>
      val tk = searcher.search(q, 5)
      val bl = ClusterBitmap.search(idx, store, d, q, 5)
      assert(tk.checked >= tk.hits.count(_._2 > 0) && tk.checked <= n - 1)
      assert(bl.checked >= bl.hits.count(_._2 > 0) && bl.checked <= n - 1)
      tk.hits.map(_._2).zip(bl.hits.map(_._2)).foreach { case (a, b) =>
        assert(math.abs(a - b) < 1e-9, s"q=$q tree/baseline degree mismatch")
      }
    }
  }

  test("hashCluster is deterministic and in range") {
    (0L until 1000L).foreach { c =>
      val x = ClusterBitmap.hashCluster(c, 16)
      assert(x >= 0 && x < 16)
      assert(x == ClusterBitmap.hashCluster(c, 16))
    }
  }

  test("clusterOf falls back to spatial (unit-keyed) clusters for unmined cells") {
    val (_, _, idx, _) = setup(10, 507, nClusters = 8)
    val unseenA = Cells.encode(9999, 3)
    val unseenB = Cells.encode(8888, 3) // same unit, different time
    assert(idx.clusterOf(1, unseenA) == ClusterBitmap.hashCluster(3L, 8))
    assert(idx.clusterOf(1, unseenA) == idx.clusterOf(1, unseenB),
      "locality clustering must ignore time for unmined cells")
  }

  test("rankAll is a total ranking sorted by degree desc") {
    val (_, store, _, d) = setup(30, 508)
    val ranked = BruteForce.rankAll(store, d, 0L)
    assert(ranked.size == store.entities.size - 1)
    assert(ranked.map(_._2).sorted.reverse == ranked.map(_._2))
  }
}
