package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core._
import repro.exp.{Harness, Workloads}
import repro.mobility.ImParams

/** Diagnostic entrypoint used while tuning the reproduction: prints trace
  * length stats, top-k degree profiles, and PE per k for one build.
  */
object DiagJob {
  def main(args: Array[String]): Unit = {
    val n = if (args.length > 0) args(0).toLong else 8000L
    val nh = if (args.length > 1) args(1).toInt else 512
    val real = args.contains("real")
    val spark = SparkSession.builder.appName("diag").getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    val (sp, cells) =
      if (real) Workloads.real(spark, Workloads.RealConfig(nEntities = n))
      else Workloads.syn(spark, Workloads.SynConfig(nEntities = n, im = ImParams(horizon = 240)))
    val built = Harness.build(spark, sp, cells, nh)
    val store = built.store
    val lens = store.entities.toSeq.map(e => store.sizes(e)(sp.m - 1)).sorted
    println(s"len: min=${lens.head} p25=${lens(lens.size / 4)} med=${lens(lens.size / 2)} " +
      s"p75=${lens(3 * lens.size / 4)} max=${lens.last} mean=${lens.sum / lens.size}")
    println(s"tree: nodes=${built.tree.nodeCount} leaves=${built.tree.leafCount}")
    val d = AdmMeasure(sp.m, 1, 1)
    val searcher = new TopKSearcher(built.tree, store, built.hasher, d)
    val queries = Harness.pickQueries(store, 8)
    queries.take(3).foreach { q =>
      val ranked = repro.baseline.BruteForce.rankAll(store, d, q)
      println(s"q=$q len=${store.sizes(q).mkString(",")} degrees: " +
        Seq(0, 1, 4, 9, 24, 49, 99).filter(_ < ranked.size).map(i => f"#${i + 1}:${ranked(i)._2}%.3f").mkString(" "))
    }
    Seq(1, 10, 50).foreach { k =>
      val st = Harness.measurePe(searcher, store, queries, k)
      println(f"k=$k%2d avgPe=${st.avgPe}%.4f avgChecked=${st.avgChecked}%.0f kth=${st.avgKthDegree}%.3f ms=${st.avgMillis}%.1f")
    }
    spark.stop()
  }
}
