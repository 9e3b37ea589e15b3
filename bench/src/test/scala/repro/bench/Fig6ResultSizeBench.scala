package repro.bench

import repro.SparkSpec
import repro.analysis.Metrics
import repro.baseline.ClusterBitmap
import repro.exp.Harness

/** Figure 6 (§6.7): PE vs result size k, MinSigTree vs the cluster/bitmap
  * baseline, on SYN and the REAL-surrogate.
  *
  * Paper claims: PE decreases slightly (worsens) as k grows for MinSigTree;
  * MinSigTree outperforms the baseline by large factors at every k.
  */
class Fig6ResultSizeBench extends SparkSpec {

  private val ks = Seq(1, 10, 25, 50)

  private def run(name: String, data: (repro.spindex.SpIndex, org.apache.spark.sql.DataFrame)): Unit = {
    val (sp, cells) = data
    val (built, searcher, queries) = BenchData.pipeline(sp, cells, BenchData.DefaultNh)
    val n = built.store.entities.size
    val idx = ClusterBitmap.build(spark, cells, sp, nClusters = 64, minSupport = 3)
    val d = BenchData.admOf(sp)

    val rows = ks.map { k =>
      val tree = Harness.measurePe(searcher, built.store, queries, k).avgPe
      val base = queries.map { q =>
        Metrics.pe(ClusterBitmap.search(idx, built.store, d, q, k).checked, k, n)
      }.sum / queries.size
      (k, tree, base)
    }

    Harness.printTable(
      s"Figure 6 — PE vs k ($name) [paper: MinSigTree << baseline at every k]",
      Seq("k", "MinSigTree", "baseline", "baseline/MinSigTree"),
      rows.map { case (k, t, b) =>
        Seq(k.toString, Harness.f(t), Harness.f(b), f"${b / math.max(t, 1e-4)}%.1fx")
      })

    // Crisp claims: the baseline never beats MinSigTree; PE degrades with k.
    rows.foreach { case (k, t, b) =>
      assert(b >= t - 0.02, s"$name k=$k: baseline PE $b should be >= MinSigTree PE $t")
    }
    assert(rows.head._2 <= rows.last._2 + 0.05,
      s"$name: PE should not improve as k grows: ${rows.map(_._2)}")
  }

  test("Figure 6: PE vs result size (SYN)") { run("SYN", BenchData.syn) }
  test("Figure 6: PE vs result size (REAL-surrogate)") { run("REAL", BenchData.real) }
}
