package repro.bench

import repro.SparkSpec
import repro.analysis.PeModel
import repro.core.TraceStore
import repro.exp.Harness

/** Figure 2 (§6.3): PE vs the number of hash functions, predicted vs
  * measured, on SYN and the REAL-surrogate, for Top-1/10/50.
  *
  * Prediction: the §5.3 model extended to multi-coordinate pruning
  * (`PeModel.predictPeSampled`), fed — as in the paper — with
  * simulation-estimated overlaps and expected k-th degrees.
  *
  * Paper claims (the figure's numeric values are not in the text):
  *  - measured PE improves (drops) as n_h grows, with diminishing returns
  *    once entities become unique;
  *  - predicted PE is slightly better (lower) than measured.
  */
class Fig2HashCountBench extends SparkSpec {

  private val nhs = Seq(16, 64, 256, 1024)
  private val SamplePairs = 400

  private def run(name: String, data: (repro.spindex.SpIndex, org.apache.spark.sql.DataFrame)): Unit = {
    val (sp, cells) = data
    // Overlap sample for the model, independent of n_h: per query, base
    // trace lengths and base-cell overlaps of a stride sample of entities.
    val store0 = TraceStore.fromCells(spark, cells, sp)
    val queries = Harness.pickQueries(store0, BenchData.NQueries)
    val all = store0.entities.toSeq.sorted
    val stride = math.max(1, all.size / SamplePairs)
    val sample = all.grouped(stride).map(_.head).toSeq
    val pairs: Map[Long, Seq[(Int, Int)]] = queries.map { q =>
      q -> sample.filterNot(_ == q).map { e =>
        (store0.sizes(e)(sp.m - 1), store0.overlaps(q, e)(sp.m - 1))
      }
    }.toMap

    val rows = nhs.map { nh =>
      val (built, searcher, _) = BenchData.pipeline(sp, cells, nh)
      val perK = BenchData.Ks.map { k =>
        val stats = Harness.measurePe(searcher, built.store, queries, k)
        val coords = math.min(nh, built.tree.pruneCoords)
        val predicted = queries.map { q =>
          val qLen = store0.sizes(q)(sp.m - 1)
          val nc = PeModel.ncFromDegree(math.max(stats.avgKthDegree, 1e-6), qLen, sp.m, 1, 1)
          PeModel.predictPeSampled(qLen, nh, coords, nc, pairs(q))
        }.sum / queries.size
        (k, stats.avgPe, predicted)
      }
      (nh, perK)
    }
    Harness.printTable(
      s"Figure 2 — PE vs n_h ($name) [measured / predicted]",
      Seq("n_h") ++ BenchData.Ks.map(k => s"Top-$k"),
      rows.map { case (nh, perK) =>
        Seq(nh.toString) ++ perK.map { case (_, m, p) => s"${Harness.f(m)} / ${Harness.f(p)}" }
      })
    // Claims: measured PE drops substantially from the smallest to the
    // largest n_h for every k, and the model tracks the trend (predicted
    // also non-increasing).
    BenchData.Ks.indices.foreach { ki =>
      val measured = rows.map(_._2(ki)._2)
      val predicted = rows.map(_._2(ki)._3)
      assert(measured.head >= measured.last - 0.02,
        s"$name Top-${BenchData.Ks(ki)}: PE should drop with n_h: $measured")
      assert(predicted.head >= predicted.last - 0.02,
        s"$name Top-${BenchData.Ks(ki)}: predicted PE should drop with n_h: $predicted")
    }
  }

  test("Figure 2: PE vs number of hash functions (SYN)") { run("SYN", BenchData.syn) }
  test("Figure 2: PE vs number of hash functions (REAL-surrogate)") { run("REAL", BenchData.real) }
}
