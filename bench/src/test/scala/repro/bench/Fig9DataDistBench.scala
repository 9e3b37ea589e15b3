package repro.bench

import repro.SparkSpec
import repro.baseline.BruteForce
import repro.core.TraceStore
import repro.exp.Harness

/** Figures 9 and 10 (Appendix C): data distribution.
  *
  * Figure 9(a,b): number of entities forming AjPIs with a given entity at
  * each level (coarser levels strictly dominate). Figure 9(c): AjPI
  * duration distribution by level. Figure 10: association degree histogram
  * under u=1, v=1 (paper claim: most entities bear low degrees).
  */
class Fig9DataDistBench extends SparkSpec {

  private def ajpiCounts(store: TraceStore, queries: Seq[Long]): Seq[Double] = {
    val sp = store.sp
    (1 to sp.m).map { l =>
      queries.map { q =>
        store.entities.count(e => e != q && store.overlaps(q, e)(l - 1) > 0).toDouble
      }.sum / queries.size
    }
  }

  test("Figure 9(a,b): avg number of entities forming AjPIs per level (SYN, REAL)") {
    for ((name, data) <- Seq("SYN" -> BenchData.syn, "REAL" -> BenchData.real)) {
      val (sp, cells) = data
      val store = TraceStore.fromCells(spark, cells, sp)
      val queries = Harness.pickQueries(store, 10)
      val counts = ajpiCounts(store, queries)
      Harness.printTable(
        s"Figure 9 — avg entities forming AjPIs with a query entity ($name) [paper: coarser >> finer]",
        (1 to sp.m).map(l => s"level $l"),
        Seq(counts.map(c => f"$c%.0f")))
      // Crisp claim: counts are non-increasing with level depth.
      assert(counts.zip(counts.tail).forall { case (a, b) => a >= b },
        s"$name AjPI counts must shrink with depth: $counts")
    }
  }

  test("Figure 9(c): AjPI duration distribution by level (SYN)") {
    val (sp, cells) = BenchData.syn
    val store = TraceStore.fromCells(spark, cells, sp)
    val queries = Harness.pickQueries(store, 6)
    val buckets = Seq(1, 10, 100, Int.MaxValue)
    val rows = (1 to sp.m).map { l =>
      val durs = queries.flatMap { q =>
        store.entities.toSeq.filter(_ != q).map(e => store.overlaps(q, e)(l - 1)).filter(_ > 0)
      }
      val hist = buckets.indices.map { i =>
        val lo = if (i == 0) 1 else buckets(i - 1) + 1
        durs.count(d => d >= lo && d <= buckets(i))
      }
      Seq(s"level $l") ++ hist.map(_.toString)
    }
    Harness.printTable(
      "Figure 9(c) — AjPI duration histogram (hours, per level, SYN)",
      Seq("level", "1-1", "2-10", "11-100", ">100"),
      rows)
  }

  test("Figure 10: association degree distribution (SYN, u=1, v=1)") {
    val (sp, cells) = BenchData.syn
    val store = TraceStore.fromCells(spark, cells, sp)
    val d = BenchData.admOf(sp)
    val queries = Harness.pickQueries(store, 6)
    val edges = Seq(0.0001, 0.001, 0.01, 0.1, 1.0)
    val hist = new Array[Long](edges.size + 1)
    queries.foreach { q =>
      BruteForce.rankAll(store, d, q).foreach { case (_, deg) =>
        val b = edges.indexWhere(deg <= _) match { case -1 => edges.size; case i => i }
        hist(if (deg == 0.0) 0 else b + 1) += 1
      }
    }
    Harness.printTable(
      "Figure 10 — association degree histogram [paper: mass concentrates at low degrees]",
      Seq("zero") ++ edges.map(e => s"<=$e"),
      Seq(hist.map(_.toString).toSeq))
    // Crisp claim: low-degree mass dominates high-degree mass.
    assert(hist.take(hist.length - 1).sum > hist.last * 10,
      s"degree mass should concentrate at low values: ${hist.toSeq}")
  }
}
