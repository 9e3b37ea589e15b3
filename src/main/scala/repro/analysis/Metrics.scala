package repro.analysis

/** Ranking-comparison metrics of Appendix D and Definition 5.1. */
object Metrics {

  /** Kendall's tau distance (Eq. 22) between two rankings of the same
    * element set, normalized to [0, 1] by n(n-1)/2 (the paper's n(n-2)/2 is
    * a typo — it is negative for n = 1 and the cited Kendall/Fagin
    * normalization is n(n-1)/2). Identical lists → 0, reversed → 1.
    */
  def kendallTau[A](r1: Seq[A], r2: Seq[A]): Double = {
    require(r1.toSet == r2.toSet, "rankings must cover the same elements")
    val n = r1.size
    if (n < 2) return 0.0
    val pos2 = r2.zipWithIndex.toMap
    var discordant = 0
    for (i <- 0 until n; j <- (i + 1) until n)
      if (pos2(r1(i)) > pos2(r1(j))) discordant += 1
    discordant.toDouble * 2 / (n * (n - 1))
  }

  /** Fagin's top-k list distance K_avg (Eq. 21): pad each top-k list with
    * the other's missing elements (appended in the other's order) and take
    * Kendall's tau of the padded lists.
    */
  def kAvg[A](rp: Seq[A], rq: Seq[A]): Double = {
    val sp = rp.toSet
    val sq = rq.toSet
    val p = rp ++ rq.filterNot(sp.contains)
    val q = rq ++ rp.filterNot(sq.contains)
    kendallTau(p, q)
  }

  /** Mean absolute difference of degrees at each rank (Eq. 21, ADDiff). */
  def adDiff(dp: Seq[Double], dq: Seq[Double]): Double = {
    require(dp.size == dq.size && dp.nonEmpty)
    dp.zip(dq).map { case (a, b) => math.abs(a - b) }.sum / dp.size
  }

  /** Pruning effectiveness (Definition 5.1): (|E'| - k)/|E|, clamped ≥ 0;
    * lower is better.
    */
  def pe(checked: Int, k: Int, nEntities: Int): Double =
    math.max(0, checked - k).toDouble / nEntities
}
