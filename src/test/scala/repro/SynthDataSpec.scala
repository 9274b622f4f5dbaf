package repro

/** Smoke coverage for the provided TPC-H-lite generators (kept healthy even
  * though this paper's evaluation is graph-based). */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates the expected row count and schema") {
    val df = SynthData.lineitem(spark, sf = 0.001)
    assert(df.count() == 6000)
    assert(df.columns.toSet.contains("l_orderkey"))
    assert(df.columns.length == 10)
  }

  test("orders/customer/part row counts scale with sf") {
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
    assert(SynthData.part(spark, 0.001).count() == 200)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.0005, seed = 7).collect().map(_.toString).sorted
    val b = SynthData.lineitem(spark, 0.0005, seed = 7).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("zipf keys are skewed, uniform keys are not") {
    val zipf = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000).groupBy("k").count()
    val topShare = zipf.orderBy(org.apache.spark.sql.functions.desc("count"))
      .limit(10).collect().map(_.getLong(1)).sum.toDouble / 20000
    assert(topShare > 0.3, s"zipf top-10 share $topShare")
    val uni = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000).groupBy("k").count()
    val uniTop = uni.orderBy(org.apache.spark.sql.functions.desc("count"))
      .limit(10).collect().map(_.getLong(1)).sum.toDouble / 20000
    assert(uniTop < 0.05, s"uniform top-10 share $uniTop")
  }
}
