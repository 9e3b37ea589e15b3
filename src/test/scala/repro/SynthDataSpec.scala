package repro

/** Sanity checks for the provided synthetic OLAP generators (kept healthy
  * because the oracle and any ad-hoc experiments rely on them).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem at SF=0.001 has the expected shape") {
    val df = SynthData.lineitem(spark, sf = 0.001)
    assert(df.count() == 6000)
    assert(df.columns.contains("l_orderkey") && df.columns.contains("l_shipdate"))
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001).collect().map(_.toString).sorted.toSeq
    val b = SynthData.orders(spark, 0.001).collect().map(_.toString).sorted.toSeq
    assert(a == b)
  }

  test("zipfKeys is skewed; uniformKeys is not") {
    import org.apache.spark.sql.functions._
    val z = SynthData.zipfKeys(spark, 20000, 1000, alpha = 1.2)
      .groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect().head.getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
      .groupBy("k").count().orderBy(desc("count")).limit(1)
      .collect().head.getLong(1)
    assert(z > u * 3, s"zipf top key count $z should dwarf uniform's $u")
  }

  test("customer keys are dense 1..N") {
    import spark.implicits._
    val keys = SynthData.customer(spark, 0.001).select("c_custkey").as[Long].collect().sorted
    assert(keys.head == 1 && keys.last == keys.length)
  }
}
