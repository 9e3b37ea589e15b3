package repro.core

import repro.SparkSpec
import repro.baseline.BruteForce
import repro.mobility.TraceGen
import repro.spindex.SpIndex

/** The distributed scan/prune search path (§4.2 on Spark): equivalence with
  * the driver search and with brute force.
  */
class DistributedTopKSpec extends SparkSpec {

  private def setup(nEntities: Int, seed: Long) = {
    val sp = SpIndex.build(16, 3, 2.0, 1.0)
    val cells = TraceGen.syn(spark, 16, nEntities,
      repro.mobility.ImParams(horizon = 40), seed)
    val store = TraceStore.fromCells(spark, cells, sp)
    val levelCells = Cells.levelCells(spark, cells, sp).cache()
    val h = new AdditiveHasher(sp, 8, seed + 1)
    val tree = MinSigTree.fromCells(spark, cells, sp, h)
    val d = AdmMeasure(sp.m, 1, 1)
    (sp, store, levelCells, h, tree, d)
  }

  test("degrees DataFrame matches the driver brute force for all entities") {
    val (sp, store, levelCells, _, _, d) = setup(60, 401)
    val q = 0L
    val got = {
      import spark.implicits._
      BruteForce.degreesDf(spark, levelCells, q, d, sp)
        .as[(Long, Double)].collect().toMap
    }
    val expected = BruteForce.rankAll(store, d, q).filter(_._2 > 0).toMap
    assert(got.keySet == expected.keySet)
    got.foreach { case (e, deg) => assert(math.abs(deg - expected(e)) < 1e-9, s"entity $e") }
  }

  test("distributed search returns the same degree sequence as the driver search") {
    val (_, store, levelCells, h, tree, d) = setup(80, 402)
    val searcher = new TopKSearcher(tree, store, h, d)
    for (q <- Seq(0L, 7L, 19L); k <- Seq(1, 5)) {
      val driver = searcher.search(q, k).hits.map(_._2).filter(_ > 0)
      val dist = DistributedTopK.search(spark, tree, levelCells, h, d, q, k).hits.map(_._2)
      assert(dist.size == driver.size, s"q=$q k=$k")
      dist.zip(driver).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9, s"q=$q k=$k") }
    }
  }

  test("distributed search with tiny batches still terminates correctly") {
    val (_, store, levelCells, h, tree, d) = setup(50, 403)
    val searcher = new TopKSearcher(tree, store, h, d)
    val driver = searcher.search(3L, 3).hits.map(_._2).filter(_ > 0)
    val dist = DistributedTopK.search(spark, tree, levelCells, h, d, 3L, 3, batchEntities = 2)
      .hits.map(_._2)
    dist.zip(driver).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
  }

  test("distributed search checked count never exceeds |E| - 1") {
    val (_, store, levelCells, h, tree, d) = setup(40, 404)
    val r = DistributedTopK.search(spark, tree, levelCells, h, d, 1L, 2)
    assert(r.checked <= store.entities.size - 1)
  }

  test("queryCells extracts per-level sorted cells") {
    val (sp, store, levelCells, _, _, _) = setup(20, 405)
    val qc = DistributedTopK.queryCells(spark, levelCells, 2L, sp.m)
    for (l <- 1 to sp.m)
      assert(qc(l - 1).toSeq == store.levelCells(2L, l).toSeq)
  }

  test("queryCells for an absent entity throws") {
    val (sp, _, levelCells, _, _, _) = setup(10, 406)
    intercept[IllegalArgumentException](
      DistributedTopK.queryCells(spark, levelCells, 888L, sp.m))
  }
}
