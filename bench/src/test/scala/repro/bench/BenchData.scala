package repro.bench

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.{AdmMeasure, Measure, TopKSearcher, TraceStore}
import repro.exp.{Harness, Workloads}
import repro.mobility.ImParams
import repro.spindex.SpIndex

/** Shared datasets and defaults for the bench suites (built once per JVM).
  *
  * Scale (see DESIGN.md §3): |E| = 8,000 entities on a 64×64 grid (4,096
  * base units), m = 4 levels, 240 h horizon — the paper's setup shrunk
  * ~4 orders of magnitude so each sweep finishes in minutes on a 16-core
  * local Spark while preserving curve shapes.
  */
object BenchData {

  def spark: SparkSession = repro.SparkSpec.shared

  val NEntities = 8000L
  val Side = 64
  val Horizon = 240
  val Ks = Seq(1, 10, 50)
  val NQueries = 24
  val DefaultNh = 256

  lazy val syn: (SpIndex, DataFrame) = {
    val (sp, cells) = Workloads.syn(spark, Workloads.SynConfig(
      nEntities = NEntities, side = Side, im = ImParams(horizon = Horizon)))
    (sp, cells.cache())
  }

  lazy val real: (SpIndex, DataFrame) = {
    val (sp, cells) = Workloads.real(spark, Workloads.RealConfig(
      nEntities = NEntities, side = Side, horizon = Horizon))
    (sp, cells.cache())
  }

  def admOf(sp: SpIndex): Measure = AdmMeasure(sp.m, 1, 1)

  /** Build the index at `nh` and return (built, searcher, queries). */
  def pipeline(sp: SpIndex, cells: DataFrame, nh: Int, measure: Measure = null): (Harness.Built, TopKSearcher, Seq[Long]) = {
    val built = Harness.build(spark, sp, cells, nh)
    val d = if (measure == null) admOf(sp) else measure
    val searcher = new TopKSearcher(built.tree, built.store, built.hasher, d)
    (built, searcher, Harness.pickQueries(built.store, NQueries))
  }

  /** Mean trace length (base cells per entity), for the PE model. */
  def meanLen(store: TraceStore): Int = {
    val sizes = store.entities.toSeq.map(e => store.sizes(e)(store.sp.m - 1))
    math.max(1, sizes.sum / sizes.size)
  }
}
