package repro.mobility

import repro.SparkSpec

/** Spark-side trace generation: determinism, schema, and the qualitative
  * differences between SYN and the REAL-surrogate (§6.1 / DESIGN.md §3).
  */
class TraceGenSpec extends SparkSpec {

  test("syn matches the driver-side simulator exactly") {
    import spark.implicits._
    val p = ImParams(horizon = 30)
    val df = TraceGen.syn(spark, 16, 15, p, seed = 9)
    val got = df.as[(Long, Int, Int)].collect().groupBy(_._1)
      .view.mapValues(_.map(r => (r._2, r._3)).sortBy(identity).toSeq).toMap
    val expected = TraceGen.synLocal(16, 15, p, seed = 9)
      .view.mapValues(_.sortBy(identity).toSeq).toMap
    assert(got == expected)
  }

  test("syn is deterministic across invocations") {
    val p = ImParams(horizon = 20)
    val a = TraceGen.syn(spark, 16, 10, p, 1).collect().map(_.toString).sorted.toSeq
    val b = TraceGen.syn(spark, 16, 10, p, 1).collect().map(_.toString).sorted.toSeq
    assert(a == b)
  }

  test("syn schema and bounds") {
    import spark.implicits._
    val df = TraceGen.syn(spark, 8, 5, ImParams(horizon = 10), 2)
    assert(df.columns.toSeq == Seq("entity", "t", "loc"))
    val rows = df.as[(Long, Int, Int)].collect()
    assert(rows.forall { case (e, t, loc) => e >= 0 && e < 5 && t >= 0 && t < 10 && loc >= 0 && loc < 64 })
  }

  test("realLike is deterministic, in-bounds, and deduplicated") {
    import spark.implicits._
    val a = TraceGen.realLike(spark, 16, 10, horizon = 30, seed = 3)
    val b = TraceGen.realLike(spark, 16, 10, horizon = 30, seed = 3)
    assert(a.collect().map(_.toString).sorted.toSeq == b.collect().map(_.toString).sorted.toSeq)
    val rows = a.as[(Long, Int, Int)].collect()
    assert(rows.forall { case (_, t, loc) => t >= 0 && t < 30 && loc >= 0 && loc < 256 })
    assert(rows.distinct.length == rows.length, "duplicate (entity, t, loc) rows")
  }

  test("realLike location popularity is heavily skewed (hotspots)") {
    import spark.implicits._
    val df = TraceGen.realLike(spark, 16, 300, horizon = 50, seed = 4)
    val counts = df.as[(Long, Int, Int)].collect().groupBy(_._3).view.mapValues(_.length).values.toSeq.sorted.reverse
    val total = counts.sum.toDouble
    val topShare = counts.take(math.max(1, counts.size / 20)).sum / total
    assert(topShare > 0.3, s"top-5% locations carry only ${topShare * 100}%% of visits")
  }

  test("realLike entities revisit their home hotspot") {
    import spark.implicits._
    val df = TraceGen.realLike(spark, 16, 50, horizon = 60, seed = 5)
    val byEntity = df.as[(Long, Int, Int)].collect().groupBy(_._1)
    val homeShares = byEntity.values.map { rows =>
      val counts = rows.groupBy(_._3).view.mapValues(_.length).values.toSeq
      counts.max.toDouble / counts.sum
    }
    assert(homeShares.sum / homeShares.size > 0.3, "home bias should dominate visits")
  }

  test("syn traces are sparse (detection-sampled) and variable-length") {
    import spark.implicits._
    val horizon = 120
    val lens = TraceGen.syn(spark, 16, 40, ImParams(horizon = horizon), 6)
      .as[(Long, Int, Int)].collect().groupBy(_._1).values.map(_.length).toSeq
    assert(lens.max < horizon, "detection sampling must leave gaps")
    assert(lens.max > lens.min, "detection rates vary per entity")
  }

  test("companion groups: in-group base-cell overlap dwarfs cross-group overlap") {
    val g = 8
    val traces = TraceGen.synLocal(16, 32, ImParams(horizon = 120), seed = 7, groupSize = g)
    def cells(e: Long) = traces(e).toSet
    def dice(a: Long, b: Long): Double = {
      val (ca, cb) = (cells(a), cells(b))
      2.0 * ca.intersect(cb).size / (ca.size + cb.size)
    }
    // Leader (0) vs its low-noise companion (1) vs an unrelated leader (8).
    val inGroup = Seq(dice(0, 1), dice(8, 9), dice(16, 17)).sum / 3
    val crossGroup = Seq(dice(0, 8), dice(8, 16), dice(0, 16)).sum / 3
    assert(inGroup > 0.1, s"companions should overlap: $inGroup")
    assert(inGroup > crossGroup * 3, s"in-group $inGroup should dwarf cross-group $crossGroup")
  }

  test("companion noise ramp: higher roles are less associated with the leader") {
    val g = 8
    val traces = TraceGen.synLocal(16, 3 * g, ImParams(horizon = 240), seed = 8, groupSize = g)
    def dice(a: Long, b: Long): Double = {
      val (ca, cb) = (traces(a).toSet, traces(b).toSet)
      2.0 * ca.intersect(cb).size / (ca.size + cb.size)
    }
    // Averaged over 3 groups: role-1 members resemble the leader more than
    // role-7 members do.
    val low = (0 until 3).map(i => dice(i * g, i * g + 1)).sum / 3
    val high = (0 until 3).map(i => dice(i * g, i * g + 7)).sum / 3
    assert(low > high, s"noise ramp violated: role1=$low role7=$high")
  }

  test("realLike device pairs share their home and sessions") {
    import spark.implicits._
    val rows = TraceGen.realLike(spark, 16, 40, horizon = 80, seed = 9)
      .as[(Long, Int, Int)].collect().groupBy(_._1)
    def dice(a: Long, b: Long): Double = {
      val ca = rows(a).map(r => (r._2, r._3)).toSet
      val cb = rows(b).map(r => (r._2, r._3)).toSet
      2.0 * ca.intersect(cb).size / (ca.size + cb.size)
    }
    val paired = Seq(dice(0, 1), dice(2, 3), dice(4, 5), dice(6, 7)).sum / 4
    val unpaired = Seq(dice(0, 2), dice(1, 4), dice(3, 6)).sum / 3
    assert(paired > unpaired, s"device pairs ($paired) should out-overlap strangers ($unpaired)")
  }
}
