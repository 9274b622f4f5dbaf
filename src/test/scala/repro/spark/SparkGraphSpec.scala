package repro.spark

import repro.{Oracle, SparkSpec, TestUtil}
import repro.core.{Edge, FourClique, Triangle, Wedge}
import repro.exact.ExactDynamicCounter
import repro.graphgen.{Datasets, Generators}

class SparkGraphSpec extends SparkSpec {

  private def pairs(keys: Array[Long]) = TestUtil.keysToPairs(keys)

  private val graphs: Seq[(String, Array[Long])] = Seq(
    "er"      -> Generators.erdosRenyi(n = 40, m = 150, seed = 1),
    "ff"      -> Generators.forestFire(n = 60, p = 0.45, seed = 2),
    "planted" -> Generators.plantedPartition(4, 12, 0.35, 20, seed = 3),
  )

  for ((label, keys) <- graphs) {
    test(s"triangle count matches DuckDB oracle ($label)") {
      val df = SparkGraph.edgesDF(spark, keys)
      Oracle.assertEquivalent(SparkGraph.triangleCount(df), SparkGraph.Sql.triangle, "edges" -> df)
    }

    test(s"wedge count matches DuckDB oracle ($label)") {
      val df = SparkGraph.edgesDF(spark, keys)
      Oracle.assertEquivalent(SparkGraph.wedgeCount(df), SparkGraph.Sql.wedge, "edges" -> df)
    }

    test(s"4-clique count matches DuckDB oracle ($label)") {
      val df = SparkGraph.edgesDF(spark, keys)
      Oracle.assertEquivalent(SparkGraph.fourCliqueCount(df), SparkGraph.Sql.fourClique, "edges" -> df)
    }

    test(s"DataFrame counts agree with the incremental exact counter ($label)") {
      val df = SparkGraph.edgesDF(spark, keys)
      def head(d: org.apache.spark.sql.DataFrame): Double = d.collect()(0).getDouble(0)
      assert(head(SparkGraph.triangleCount(df)) == ExactDynamicCounter.staticCount(Triangle, pairs(keys)).toDouble)
      assert(head(SparkGraph.wedgeCount(df)) == ExactDynamicCounter.staticCount(Wedge, pairs(keys)).toDouble)
      assert(head(SparkGraph.fourCliqueCount(df)) == ExactDynamicCounter.staticCount(FourClique, pairs(keys)).toDouble)
    }
  }

  test("DataFrame counts agree with brute force on a clique") {
    val keys = TestUtil.clique(7).map { case (u, v) => Edge.key(u, v) }.toArray
    val df = SparkGraph.edgesDF(spark, keys)
    assert(SparkGraph.triangleCount(df).collect()(0).getDouble(0) == 35.0)  // C(7,3)
    assert(SparkGraph.fourCliqueCount(df).collect()(0).getDouble(0) == 35.0) // C(7,4)
    assert(SparkGraph.wedgeCount(df).collect()(0).getDouble(0) == 7.0 * 15)  // 7·C(6,2)
  }

  test("empty graph counts are zero (wedge aggregate has a coalesce)") {
    val df = SparkGraph.edgesDF(spark, Array.empty[Long])
    assert(SparkGraph.wedgeCount(df).collect()(0).getDouble(0) == 0.0)
    assert(SparkGraph.triangleCount(df).collect()(0).getDouble(0) == 0.0)
  }

  test("dataset proxies count consistently on Spark and the exact counter") {
    val keys = Datasets.test("synthetic", 400)
    val df = SparkGraph.edgesDF(spark, keys)
    Oracle.assertEquivalent(SparkGraph.triangleCount(df), SparkGraph.Sql.triangle, "edges" -> df)
    assert(SparkGraph.triangleCount(df).collect()(0).getDouble(0)
      == ExactDynamicCounter.staticCount(Triangle, pairs(keys)).toDouble)
  }
}
