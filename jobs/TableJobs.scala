package repro.jobs

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.analysis.{Metrics, PeModel}
import repro.baseline.{BruteForce, ClusterBitmap}
import repro.core._
import repro.exp.{Harness, Workloads}
import repro.mobility.ImParams
import repro.spindex.SpIndex

/** One spark-submit entrypoint per evaluation exhibit (Table 2, Figures
  * 2–10). These mirror the bench suites under `bench/` at a spark-submit
  * friendly default scale; the bench suites remain the canonical harness
  * with the paper-claim assertions.
  *
  * Every job accepts [nEntities] [nHash] as optional leading args.
  */
private[jobs] object JobEnv {
  final case class Env(
      spark: SparkSession,
      sp: SpIndex,
      cells: DataFrame,
      built: Harness.Built,
      queries: Seq[Long],
  )

  def make(args: Array[String], name: String, real: Boolean = false): Env = {
    val nEntities = if (args.length > 0) args(0).toLong else 4000L
    val nh = if (args.length > 1) args(1).toInt else 128
    val spark = SparkSession.builder.appName(name).getOrCreate()
    val (sp, cells) =
      if (real) Workloads.real(spark, Workloads.RealConfig(nEntities = nEntities))
      else Workloads.syn(spark, Workloads.SynConfig(nEntities = nEntities, im = ImParams(horizon = 240)))
    val built = Harness.build(spark, sp, cells.cache(), nh)
    Env(spark, sp, cells, built, Harness.pickQueries(built.store, 16))
  }

  def searcher(env: Env, measure: Measure = null): TopKSearcher = {
    val d = if (measure == null) AdmMeasure(env.sp.m, 1, 1) else measure
    new TopKSearcher(env.built.tree, env.built.store, env.built.hasher, d)
  }
}

/** Table 2: ADM simulation effectiveness vs Dice/Jaccard/Cosine. */
object RunTable2Job {
  def main(args: Array[String]): Unit = {
    val env = JobEnv.make(args, "table2")
    val ks = Seq(1, 10, 50)
    val targets = Seq(
      ("Dice", AdmMeasure(env.sp.m, 1, 1.0), DiceMeasure(env.sp.m)),
      ("Jaccard", AdmMeasure(env.sp.m, 1, 1.2), JaccardMeasure(env.sp.m)),
      ("Cosine", AdmMeasure(env.sp.m, 1, 1.0), CosineMeasure(env.sp.m)))
    val rows = targets.map { case (n, adm, other) =>
      Seq(n) ++ ks.map { k =>
        val (t, d) = env.queries.map { q =>
          val rp = BruteForce.rankAll(env.built.store, adm, q).take(k)
          val rq = BruteForce.rankAll(env.built.store, other, q).take(k)
          (Metrics.kAvg(rp.map(_._1), rq.map(_._1)), Metrics.adDiff(rp.map(_._2), rq.map(_._2)))
        }.unzip match { case (ts, ds) => (ts.sum / ts.size, ds.sum / ds.size) }
        s"${Harness.e(t)}/${Harness.e(d)}"
      }
    }
    Harness.printTable("Table 2 — K_avg/ADDiff", Seq("measure", "Top-1", "Top-10", "Top-50"), rows)
    env.spark.stop()
  }
}

/** Figure 2: PE vs number of hash functions, predicted vs measured. */
object RunFig2Job {
  def main(args: Array[String]): Unit = {
    val env0 = JobEnv.make(args, "fig2")
    val rows = Seq(8, 32, 128, 512).map { nh =>
      val built = Harness.build(env0.spark, env0.sp, env0.cells, nh)
      val s = new TopKSearcher(built.tree, built.store, built.hasher, AdmMeasure(env0.sp.m, 1, 1))
      val len = math.max(1, env0.queries.map(q => built.store.sizes(q)(env0.sp.m - 1)).sum / env0.queries.size)
      Seq(nh.toString) ++ Seq(1, 10, 50).map { k =>
        val st = Harness.measurePe(s, built.store, env0.queries, k)
        val nc = PeModel.ncFromDegree(math.max(st.avgKthDegree, 1e-6), len, env0.sp.m, 1, 1)
        s"${Harness.f(st.avgPe)}/${Harness.f(PeModel.predictPe(built.hasher.range, len, nh, nc))}"
      }
    }
    Harness.printTable("Figure 2 — PE measured/predicted vs n_h",
      Seq("n_h", "Top-1", "Top-10", "Top-50"), rows)
    env0.spark.stop()
  }
}

/** Figure 3: PE vs mobility/hierarchy parameters (one sweep per arg). */
object RunFig3Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("fig3").getOrCreate()
    val n = if (args.length > 0) args(0).toLong else 3000L
    val nh = if (args.length > 1) args(1).toInt else 128
    def pe(im: ImParams, a: Double = 2, b: Double = 2, m: Int = 4): Double = {
      val (sp, cells) = Workloads.syn(spark, Workloads.SynConfig(nEntities = n, side = 32, m = m, a = a, b = b, im = im))
      val built = Harness.build(spark, sp, cells, nh)
      val s = new TopKSearcher(built.tree, built.store, built.hasher, AdmMeasure(sp.m, 1, 1))
      Harness.measurePe(s, built.store, Harness.pickQueries(built.store, 10), 10).avgPe
    }
    val im = ImParams(horizon = 120)
    val rows = Seq(
      Seq("alpha") ++ Seq(0.3, 0.6, 1.2).map(v => Harness.f(pe(im.copy(alpha = v)))),
      Seq("beta") ++ Seq(0.4, 0.8, 1.6).map(v => Harness.f(pe(im.copy(beta = v)))),
      Seq("rho") ++ Seq(0.2, 0.6, 1.0).map(v => Harness.f(pe(im.copy(rho = v)))),
      Seq("gamma") ++ Seq(0.05, 0.2, 0.8).map(v => Harness.f(pe(im.copy(gamma = v)))),
      Seq("zeta") ++ Seq(0.6, 1.2, 2.4).map(v => Harness.f(pe(im.copy(zeta = v)))),
      Seq("a") ++ Seq(1.0, 1.5, 2.0).map(v => Harness.f(pe(im, a = v))),
      Seq("b") ++ Seq(0.5, 1.0, 2.0).map(v => Harness.f(pe(im, b = v))),
      Seq("m") ++ Seq(1, 2, 4).map(v => Harness.f(pe(im, m = v))))
    Harness.printTable("Figure 3 — PE (Top-10) vs data characteristics",
      Seq("param", "low", "mid", "high"), rows)
    spark.stop()
  }
}

/** Figure 4: PE vs ADM parameters u, v. */
object RunFig4Job {
  def main(args: Array[String]): Unit = {
    val env = JobEnv.make(args, "fig4")
    val rows = Seq(0.5, 1.0, 2.0).map { u =>
      Seq(u.toString) ++ Seq(0.5, 1.0, 2.0).map { v =>
        val s = JobEnv.searcher(env, AdmMeasure(env.sp.m, u, v))
        Harness.f(Harness.measurePe(s, env.built.store, env.queries, 10).avgPe)
      }
    }
    Harness.printTable("Figure 4 — PE (Top-10) vs ADM params", Seq("u \\ v", "0.5", "1.0", "2.0"), rows)
    env.spark.stop()
  }
}

/** Figure 5: query time vs memory fraction (cached-store substrate). */
object RunFig5Job {
  def main(args: Array[String]): Unit = {
    val env = JobEnv.make(args, "fig5")
    val dir = java.nio.file.Files.createTempDirectory("fig5job").toString
    val n = env.built.store.entities.size
    val rows = Seq(0.1, 0.5, 1.0).map { f =>
      val cached = repro.storage.CachedTraceStore.create(
        env.spark, env.cells, env.sp, s"$dir/c$f", math.max(1, (n * f).toInt))
      val s = new TopKSearcher(env.built.tree, cached, env.built.hasher, AdmMeasure(env.sp.m, 1, 1))
      val t0 = System.nanoTime()
      env.queries.take(6).foreach(q => s.search(q, 10))
      Seq(f.toString, f"${(System.nanoTime() - t0) / 1e6 / 6}%.1f")
    }
    Harness.printTable("Figure 5 — avg Top-10 query ms vs memory fraction", Seq("fraction", "ms"), rows)
    env.spark.stop()
  }
}

/** Figure 6: PE vs k, MinSigTree vs the cluster/bitmap baseline. */
object RunFig6Job {
  def main(args: Array[String]): Unit = {
    val env = JobEnv.make(args, "fig6")
    val idx = ClusterBitmap.build(env.spark, env.cells, env.sp, nClusters = 64, minSupport = 3)
    val d = AdmMeasure(env.sp.m, 1, 1)
    val s = JobEnv.searcher(env)
    val n = env.built.store.entities.size
    val rows = Seq(1, 10, 25, 50).map { k =>
      val tree = Harness.measurePe(s, env.built.store, env.queries, k).avgPe
      val base = env.queries.map(q =>
        Metrics.pe(ClusterBitmap.search(idx, env.built.store, d, q, k).checked, k, n)).sum / env.queries.size
      Seq(k.toString, Harness.f(tree), Harness.f(base))
    }
    Harness.printTable("Figure 6 — PE vs k", Seq("k", "MinSigTree", "baseline"), rows)
    env.spark.stop()
  }
}

/** Figure 7: indexing time/size vs n_h. */
object RunFig7Job {
  def main(args: Array[String]): Unit = {
    val env = JobEnv.make(args, "fig7")
    val rows = Seq(8, 32, 128, 512).map { nh =>
      val built = Harness.build(env.spark, env.sp, env.cells, nh)
      Seq(nh.toString, built.buildMillis.toString, built.tree.nodeCount.toString,
        built.tree.approxBytes.toString)
    }
    Harness.printTable("Figure 7 — indexing cost vs n_h",
      Seq("n_h", "build ms", "nodes", "bytes"), rows)
    env.spark.stop()
  }
}

/** Figure 8: update cost vs n_h, varying the share of existing entities. */
object RunFig8Job {
  def main(args: Array[String]): Unit = {
    val env = JobEnv.make(args, "fig8")
    val nUpd = (env.built.store.entities.size / 10).max(1)
    val fresh = (0 until nUpd).map(i =>
      repro.mobility.ImModel.simulate(900000L + i, 64, ImParams(horizon = 240), 77))
    val rows = Seq(8, 32, 128, 512).map { nh =>
      Seq(nh.toString) ++ Seq(1.0, 0.7, 0.4).map { share =>
        val built = Harness.build(env.spark, env.sp, env.cells, nh)
        val existing = built.store.entities.toSeq.sorted.take((nUpd * share).toInt)
        val t0 = System.nanoTime()
        existing.zipWithIndex.foreach { case (e, i) =>
          built.tree.update(e, Signatures.computeLocal(fresh(i), env.sp, built.hasher))
        }
        (existing.size until nUpd).foreach { i =>
          built.tree.insert(800000L + i, Signatures.computeLocal(fresh(i), env.sp, built.hasher))
        }
        f"${(System.nanoTime() - t0) / 1e6}%.0f"
      }
    }
    Harness.printTable("Figure 8 — update ms vs n_h",
      Seq("n_h", "100% existing", "70%", "40%"), rows)
    env.spark.stop()
  }
}

/** Figures 9–10: data distributions. */
object RunFig9Job {
  def main(args: Array[String]): Unit = {
    val env = JobEnv.make(args, "fig9")
    val store = env.built.store
    val qs = env.queries.take(6)
    val counts = (1 to env.sp.m).map { l =>
      qs.map(q => store.entities.count(e => e != q && store.overlaps(q, e)(l - 1) > 0)).sum / qs.size
    }
    Harness.printTable("Figure 9 — avg entities forming AjPIs per level",
      (1 to env.sp.m).map(l => s"level $l"), Seq(counts.map(_.toString)))
    env.spark.stop()
  }
}
