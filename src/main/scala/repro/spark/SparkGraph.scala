package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Edge

/** DataFrame/Catalyst formulations of the exact subgraph counts.
  *
  * These are the oracle-checked reference implementations: each count is a
  * pure DataFrame self-join over a canonical `u < v` edge table, and the
  * test suite diffs every result against DuckDB SQL via `repro.Oracle` and
  * against the incremental `ExactDynamicCounter`.
  */
object SparkGraph {

  /** Edge list as a DataFrame with columns `u`, `v` (Int, `u < v`). */
  def edgesDF(spark: SparkSession, edges: Array[Long]): DataFrame = {
    import spark.implicits._
    edges.map(k => (Edge.u(k), Edge.v(k))).toSeq.toDF("u", "v")
  }

  /** Triangle count: for `u < v < w`, joins (u,v)-(v,w)-(u,w). */
  def triangleCount(edges: DataFrame): DataFrame = {
    val a = edges.as("a"); val b = edges.as("b"); val c = edges.as("c")
    a.join(b, col("b.u") === col("a.v"))
      .join(c, col("c.u") === col("a.u") && col("c.v") === col("b.v"))
      .agg(count(lit(1)).cast("double").as("cnt"))
  }

  /** Wedge count: Σ_v deg(v)·(deg(v)−1)/2. */
  def wedgeCount(edges: DataFrame): DataFrame = {
    val vertices = edges.select(col("u").as("x")).unionAll(edges.select(col("v").as("x")))
    vertices.groupBy("x").agg(count(lit(1)).as("d"))
      .agg(coalesce(sum(col("d") * (col("d") - 1) / 2), lit(0)).cast("double").as("cnt"))
  }

  /** 4-clique count: for `u < v < w < x`, joins all six edges. */
  def fourCliqueCount(edges: DataFrame): DataFrame = {
    val uv = edges.as("uv"); val vw = edges.as("vw"); val wx = edges.as("wx")
    val uw = edges.as("uw"); val ux = edges.as("ux"); val vx = edges.as("vx")
    uv.join(vw, col("vw.u") === col("uv.v"))
      .join(wx, col("wx.u") === col("vw.v"))
      .join(uw, col("uw.u") === col("uv.u") && col("uw.v") === col("vw.v"))
      .join(ux, col("ux.u") === col("uv.u") && col("ux.v") === col("wx.v"))
      .join(vx, col("vx.u") === col("uv.v") && col("vx.v") === col("wx.v"))
      .agg(count(lit(1)).cast("double").as("cnt"))
  }

  /** DuckDB SQL equivalents, for `Oracle.assertEquivalent`. */
  object Sql {
    val triangle: String =
      """SELECT CAST(COUNT(*) AS DOUBLE) AS cnt
        |FROM edges a
        |JOIN edges b ON b.u = a.v
        |JOIN edges c ON c.u = a.u AND c.v = b.v""".stripMargin

    val wedge: String =
      """WITH deg AS (
        |  SELECT x, COUNT(*) AS d
        |  FROM (SELECT u AS x FROM edges UNION ALL SELECT v AS x FROM edges) t
        |  GROUP BY x
        |)
        |SELECT CAST(COALESCE(SUM(d * (d - 1) / 2), 0) AS DOUBLE) AS cnt FROM deg""".stripMargin

    val fourClique: String =
      """SELECT CAST(COUNT(*) AS DOUBLE) AS cnt
        |FROM edges uv
        |JOIN edges vw ON vw.u = uv.v
        |JOIN edges wx ON wx.u = vw.v
        |JOIN edges uw ON uw.u = uv.u AND uw.v = vw.v
        |JOIN edges ux ON ux.u = uv.u AND ux.v = wx.v
        |JOIN edges vx ON vx.u = uv.v AND vx.v = wx.v""".stripMargin
  }
}
