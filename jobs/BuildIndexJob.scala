package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.exp.{Harness, Workloads}
import repro.mobility.ImParams

/** spark-submit entrypoint: generate SYN traces, build the MinSigTree, and
  * print index statistics.
  *
  * Usage: BuildIndexJob [nEntities] [nHash]
  */
object BuildIndexJob {
  def main(args: Array[String]): Unit = {
    val nEntities = if (args.length > 0) args(0).toLong else 8000L
    val nh = if (args.length > 1) args(1).toInt else 128
    val spark = SparkSession.builder.appName("build-index").getOrCreate()
    val (sp, cells) = Workloads.syn(spark, Workloads.SynConfig(
      nEntities = nEntities, im = ImParams(horizon = 240)))
    val built = Harness.build(spark, sp, cells, nh)
    println(s"entities=${built.tree.size} nodes=${built.tree.nodeCount} " +
      s"leaves=${built.tree.leafCount} buildMillis=${built.buildMillis} " +
      s"approxBytes=${built.tree.approxBytes}")
    built.tree.nodesDataFrame(spark).show(20, truncate = false)
    spark.stop()
  }
}
