package repro.baseline

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.{Cells, DistributedTopK, Measure, TraceStore}

/** Brute-force comparator (the paper's strawman in §3): score the query
  * against every entity and sort. Serves three roles: (1) the baseline
  * whose cost motivates the index, (2) ground truth for exactness tests,
  * (3) the Spark-vs-DuckDB oracle subject.
  */
object BruteForce {

  /** Distributed full scan: DataFrame (entity, degree) for every entity
    * with non-zero overlap with the query.
    */
  def degreesDf(
      spark: SparkSession,
      levelCells: DataFrame,
      qEntity: Long,
      measure: Measure,
      sp: repro.spindex.SpIndex,
  ): DataFrame = {
    import spark.implicits._
    val qCells: Array[Array[Long]] = {
      val rows = levelCells
        .filter($"entity" === qEntity)
        .select("level", "cell")
        .as[(Int, Long)]
        .collect()
      val byLevel = rows.groupBy(_._1)
      Array.tabulate(sp.m)(li => byLevel.getOrElse(li + 1, Array.empty).map(_._2).sorted)
    }
    DistributedTopK.degrees(spark, levelCells, qEntity, qCells, measure, candidates = None)
  }

  /** Driver full scan over a TraceStore: all (entity, degree) pairs sorted
    * by (degree desc, entity asc), query excluded. Zero-degree entities
    * included so rankings are total.
    */
  def rankAll(store: TraceStore, measure: Measure, q: Long): IndexedSeq[(Long, Double)] =
    store.entities.iterator
      .filter(_ != q)
      .map(e => (e, store.degree(measure, e, q)))
      .toIndexedSeq
      .sortBy { case (e, d) => (-d, e) }

  /** Driver top-k. */
  def topK(store: TraceStore, measure: Measure, q: Long, k: Int): Seq[(Long, Double)] =
    rankAll(store, measure, q).take(k)
}
