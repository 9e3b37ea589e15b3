package repro.baseline

import scala.collection.mutable

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.{Cells, Measure, TopKResult, TraceSource}
import repro.spindex.SpIndex

/** The locality/bitmap baseline of §6.2.
  *
  * At each sp-index level, the level-l ST-cells are partitioned into
  * `nClusters` clusters via frequent co-occurrence mining (entity traces as
  * transactions; sampled pairwise co-occurrence counts; union-find over
  * frequent pairs; cells outside any frequent component fall back to a hash
  * assignment). Every entity gets an `m × nClusters`-bit vector (bit =
  * presence in ≥1 cell of that level's cluster); entities are grouped by
  * vector; a query is answered by scanning groups in descending upper-bound
  * order with the same early-termination rule as Algorithm 2.
  *
  * The UB is sound: a zero bit for (level l, cluster i) proves the group's
  * entities share no level-l query cell of cluster i, so the artificial
  * entity built from the surviving query cells dominates every member
  * (Theorem 4.1 reasoning). It is loose in practice because real traces
  * have weak cell locality — the effect §6.7 measures.
  */
final class ClusterBitmapIndex(
    val sp: SpIndex,
    val nClusters: Int,
    clusterMap: Array[java.util.HashMap[java.lang.Long, Integer]], // per level
    val groups: IndexedSeq[(Array[Long], Array[Long])], // (bit words, entities)
) extends Serializable {

  /** Cluster of a level-`level` cell. Cells outside any mined frequent
    * component fall back to a *spatial* assignment (cells of the same
    * spatial unit share a cluster regardless of time) — the §6.2 baseline
    * clusters by locality, and this is exactly why its bit vectors lose
    * temporal resolution and its upper bounds are loose.
    */
  def clusterOf(level: Int, cell: Long): Int = {
    val c = clusterMap(level - 1).get(cell)
    if (c != null) c.intValue
    else ClusterBitmap.hashCluster(repro.core.Cells.unitOf(cell).toLong, nClusters)
  }

  /** Global bit position of (level, cluster). */
  def bitOf(level: Int, cluster: Int): Int = (level - 1) * nClusters + cluster

  def bitSet(words: Array[Long], i: Int): Boolean =
    (words(i >> 6) & (1L << (i & 63))) != 0
}

object ClusterBitmap {

  private[baseline] def hashCluster(cell: Long, n: Int): Int = {
    var z = cell * 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    (((z % n) + n) % n).toInt
  }

  /** Mine per-level clusters and build the bitmap index. */
  def build(
      spark: SparkSession,
      cells: DataFrame,
      sp: SpIndex,
      nClusters: Int = 64,
      minSupport: Int = 3,
      maxCellsPerEntity: Int = 30,
      maxPairs: Int = 200000,
      seed: Long = 11,
  ): ClusterBitmapIndex = {
    import spark.implicits._
    val bcSp = spark.sparkContext.broadcast(sp)
    val base = cells.select("entity", "t", "loc").as[(Long, Int, Int)]

    // Per-entity per-level cell arrays, reused for mining and vectors.
    val perEntity = base
      .groupByKey(_._1)
      .mapGroups { (e, rows) =>
        val cs = rows.map { case (_, t, loc) => (t, loc) }.toArray
        (e, Cells.rollup(cs, bcSp.value))
      }
      .persist()

    val clusterMap = Array.fill(sp.m)(new java.util.HashMap[java.lang.Long, Integer])
    for (level <- 1 to sp.m) {
      // Frequent co-occurring cell pairs at this level, sampled per
      // transaction to bound the quadratic blowup.
      val pairs = perEntity
        .flatMap { case (e, byLevel) =>
          val rng = new java.util.SplittableRandom(seed ^ (e * 31 + level))
          val cs = byLevel(level - 1)
          val sample =
            if (cs.length <= maxCellsPerEntity) cs
            else Array.fill(maxCellsPerEntity)(cs(rng.nextInt(cs.length))).distinct
          for {
            i <- sample.indices.iterator
            j <- (i + 1) until sample.length
          } yield (math.min(sample(i), sample(j)), math.max(sample(i), sample(j)))
        }
        .groupByKey(identity)
        .count()
        .filter(_._2 >= minSupport)
        .map { case ((a, b), c) => (a, b, c) }
        .orderBy($"_3".desc)
        .limit(maxPairs)
        .collect()

      // Union-find over frequent pairs.
      val parent = mutable.HashMap.empty[Long, Long]
      def find(x: Long): Long = {
        var r = x
        while (parent.getOrElse(r, r) != r) r = parent(r)
        var c = x
        while (parent.getOrElse(c, c) != c) { val n = parent(c); parent(c) = r; c = n }
        r
      }
      pairs.foreach { case (a, b, _) =>
        val ra = find(a); val rb = find(b)
        if (ra != rb) parent(rb) = ra
      }
      val members = mutable.HashMap.empty[Long, mutable.ArrayBuffer[Long]]
      pairs.iterator.flatMap(p => Iterator(p._1, p._2)).toSet[Long].foreach { c =>
        members.getOrElseUpdate(find(c), mutable.ArrayBuffer.empty) += c
      }
      members.values.toSeq.sortBy(-_.size).take(nClusters).zipWithIndex.foreach {
        case (cs, i) => cs.foreach(c => clusterMap(level - 1).put(c, i))
      }
    }

    // Entity bit vectors, grouped by vector.
    val nBits = sp.m * nClusters
    val nWords = (nBits + 63) >> 6
    val bcMaps = spark.sparkContext.broadcast(clusterMap)
    val grouped = perEntity
      .map { case (e, byLevel) =>
        val words = new Array[Long](nWords)
        for (level <- 1 to byLevel.length; cell <- byLevel(level - 1)) {
          val cObj = bcMaps.value(level - 1).get(cell)
          val cl =
            if (cObj != null) cObj.intValue
            else hashCluster(Cells.unitOf(cell).toLong, nClusters)
          val bit = (level - 1) * nClusters + cl
          words(bit >> 6) |= 1L << (bit & 63)
        }
        (words.mkString(","), words, e)
      }
      .groupByKey(_._1)
      .mapGroups { (_, rows) =>
        val rs = rows.toArray
        (rs.head._2, rs.map(_._3).sorted)
      }
      .collect()
      .toIndexedSeq

    perEntity.unpersist()
    new ClusterBitmapIndex(sp, nClusters, clusterMap, grouped)
  }

  /** Top-k search over the bitmap index (UB-ordered group scan). */
  def search(
      idx: ClusterBitmapIndex,
      store: TraceSource,
      measure: Measure,
      q: Long,
      k: Int,
  ): TopKResult = {
    val sp = idx.sp
    val qLevel = Array.tabulate(sp.m)(li => store.levelCells(q, li + 1))
    val qSizes = qLevel.map(_.length)
    // Bit of every query cell, per level.
    val qBit = Array.tabulate(sp.m)(li => qLevel(li).map(c => idx.bitOf(li + 1, idx.clusterOf(li + 1, c))))

    def upperBound(words: Array[Long]): Double = {
      val ov = new Array[Int](sp.m)
      var li = 0
      while (li < sp.m) {
        var c = 0
        while (c < qBit(li).length) {
          if (idx.bitSet(words, qBit(li)(c))) ov(li) += 1
          c += 1
        }
        li += 1
      }
      measure.degree(ov, ov, qSizes)
    }

    val ordered = idx.groups.map { case (w, es) => (upperBound(w), es) }.sortBy(-_._1)
    val best = mutable.ArrayBuffer.empty[(Long, Double)]
    def kth: Double = if (best.size < k) -1.0 else best(k - 1)._2
    var checked = 0
    var i = 0
    while (i < ordered.size && !(best.size >= k && kth >= ordered(i)._1)) {
      store.prefetch(ordered(i)._2.filter(_ != q))
      ordered(i)._2.foreach { e =>
        if (e != q) {
          checked += 1
          best += ((e, store.degree(measure, e, q)))
        }
      }
      val sorted = best.sortBy { case (e, d) => (-d, e) }
      best.clear()
      best ++= sorted.take(k)
      i += 1
    }
    TopKResult(best.toSeq, checked, i)
  }
}
