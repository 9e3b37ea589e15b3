package repro.bench

import repro.SparkSpec
import repro.core.AdmMeasure
import repro.exp.Harness

/** Figure 4 (§6.5): PE sensitivity to the ADM parameters u (level weight)
  * and v (duration weight), on SYN and the REAL-surrogate.
  *
  * Paper claim: smaller u and larger v yield better (lower) PE — signatures
  * encode ST-cells (duration) but not levels, so duration-dominated
  * measures are easier to bound.
  */
class Fig4AdmParamBench extends SparkSpec {

  private val us = Seq(0.5, 1.0, 2.0)
  private val vs = Seq(0.5, 1.0, 2.0)
  private val k = 10

  private def run(name: String, data: (repro.spindex.SpIndex, org.apache.spark.sql.DataFrame)): Seq[Seq[Double]] = {
    val (sp, cells) = data
    val built = Harness.build(spark, sp, cells, BenchData.DefaultNh)
    val queries = Harness.pickQueries(built.store, BenchData.NQueries)
    val grid = us.map { u =>
      vs.map { v =>
        val searcher = new repro.core.TopKSearcher(built.tree, built.store, built.hasher, AdmMeasure(sp.m, u, v))
        Harness.measurePe(searcher, built.store, queries, k).avgPe
      }
    }
    Harness.printTable(
      s"Figure 4 — PE vs ADM params ($name, Top-$k) [paper: smaller u, larger v => lower PE — " +
        "DEVIATES here: both trends invert, see EXPERIMENTS.md]",
      Seq("u \\ v") ++ vs.map(_.toString),
      us.zip(grid).map { case (u, row) => Seq(u.toString) ++ row.map(Harness.f) })
    grid
  }

  test("Figure 4: PE vs ADM parameters (SYN)") {
    val grid = run("SYN", BenchData.syn)
    // Our measured trends are the inverse of the paper's: our per-level
    // pruning masks DO encode level information (levels >= a node's level
    // are pruned along the path), so level-weighted measures (large u)
    // bound tighter; and large v inflates the weight of coarse terms
    // pinned at their maximum inside every upper bound, loosening it.
    // Assert the robust measured monotonicity along v at every u.
    grid.foreach { row =>
      assert(row(0) <= row(2) + 0.05, s"measured: PE grows with v: $row")
    }
  }

  test("Figure 4: PE vs ADM parameters (REAL-surrogate)") {
    run("REAL", BenchData.real)
  }
}
