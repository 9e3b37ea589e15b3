package repro.core

import scala.collection.mutable

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Distributed top-k query processing: the scan/prune flavor of Algorithm 2.
  *
  * The MinSigTree (driver-resident, small) prices every leaf with the
  * Theorem 4.1 upper bound; leaves are then evaluated in UB-descending
  * batches, each batch scored exactly by a distributed pass over the
  * level-cells DataFrame. Terminates once the k-th exact degree dominates
  * the next unevaluated leaf's bound — the same condition as Algorithm 2,
  * so results match the driver search.
  */
object DistributedTopK {

  /** Exact degrees of candidate entities against query cells.
    *
    * @param levelCells DataFrame (entity, level, cell) — see [[Cells.levelCells]]
    * @param qCells     query's per-level cell arrays (index = level-1)
    * @return DataFrame (entity, degree) for candidates with overlap > 0
    */
  def degrees(
      spark: SparkSession,
      levelCells: DataFrame,
      qEntity: Long,
      qCells: Array[Array[Long]],
      measure: Measure,
      candidates: Option[Set[Long]] = None,
  ): DataFrame = {
    import spark.implicits._
    val m = qCells.length
    val qSizes = qCells.map(_.length)
    val bcQ = spark.sparkContext.broadcast(qCells.map(_.toSet))
    val bcCand = spark.sparkContext.broadcast(candidates)
    val bcM = spark.sparkContext.broadcast(measure)
    levelCells
      .select("entity", "level", "cell")
      .as[(Long, Int, Long)]
      .filter { r =>
        r._1 != qEntity && bcCand.value.forall(_.contains(r._1))
      }
      .groupByKey(_._1)
      .mapGroups { (e, rows) =>
        val ov = new Array[Int](m)
        val sb = new Array[Int](m)
        rows.foreach { case (_, l, c) =>
          sb(l - 1) += 1
          if (bcQ.value(l - 1).contains(c)) ov(l - 1) += 1
        }
        (e, bcM.value.degree(ov, qSizes, sb))
      }
      .filter(_._2 > 0.0)
      .toDF("entity", "degree")
  }

  /** Collect a query entity's per-level cells from the DataFrame. */
  def queryCells(spark: SparkSession, levelCells: DataFrame, q: Long, m: Int): Array[Array[Long]] = {
    import spark.implicits._
    val rows = levelCells
      .filter($"entity" === q)
      .select("level", "cell")
      .as[(Int, Long)]
      .collect()
    require(rows.nonEmpty, s"query entity $q has no trace")
    val byLevel = rows.groupBy(_._1)
    Array.tabulate(m)(li => byLevel.getOrElse(li + 1, Array.empty).map(_._2).sorted)
  }

  /** Full search; query cells are read from the DataFrame. */
  def search(
      spark: SparkSession,
      tree: MinSigTree,
      levelCells: DataFrame,
      hasher: CellHasher,
      measure: Measure,
      qEntity: Long,
      k: Int,
      batchEntities: Int = 4096,
  ): TopKResult = {
    import spark.implicits._
    val sp = tree.sp
    val qCells = queryCells(spark, levelCells, qEntity, sp.m)
    val ctx = new QueryContext(sp, hasher, measure, qCells)

    // Price every leaf: DFS accumulating partial-pruned-set masks.
    val leaves = mutable.ArrayBuffer.empty[(Double, Array[Long])]
    def dfs(node: SigNode, masks: Array[Array[Boolean]], ub: Double): Unit = {
      if (node.isLeaf) leaves += ((ub, node.entities.toArray))
      else node.children.valuesIterator.foreach { child =>
        val m2 = ctx.pruneMasks(masks, child, tree.pruneCoords)
        dfs(child, m2, math.min(ub, ctx.upperBound(m2)))
      }
    }
    dfs(tree.root, ctx.freshMasks(), 1.0)
    val ordered = leaves.sortBy(-_._1)

    val best = mutable.ArrayBuffer.empty[(Long, Double)]
    def kth: Double = if (best.size < k) -1.0 else best(k - 1)._2
    var checked = 0
    var i = 0
    while (i < ordered.size && !(best.size >= k && kth >= ordered(i)._1)) {
      // Greedily batch consecutive leaves to amortize the Spark job.
      val batch = mutable.HashSet.empty[Long]
      while (i < ordered.size && (batch.isEmpty || batch.size < batchEntities) &&
             !(best.size >= k && kth >= ordered(i)._1)) {
        ordered(i)._2.foreach(e => if (e != qEntity) batch += e)
        i += 1
      }
      if (batch.nonEmpty) {
        checked += batch.size
        val scored = degrees(spark, levelCells, qEntity, qCells, measure, Some(batch.toSet))
          .as[(Long, Double)]
          .collect()
        best ++= scored
        val sorted = best.sortBy { case (e, d) => (-d, e) }
        best.clear()
        best ++= sorted.take(k)
      }
    }
    TopKResult(best.toSeq, checked, leaves.size)
  }
}
