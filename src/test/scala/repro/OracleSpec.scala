package repro

import org.apache.spark.sql.functions._

/** The oracle itself must fail loudly on real mismatches — otherwise every
  * "oracle-checked" test is vacuous. */
class OracleSpec extends SparkSpec {

  private def df = {
    import spark.implicits._
    Seq((1, "a"), (2, "b"), (3, "c")).toDF("k", "v")
  }

  test("accepts an equivalent query") {
    Oracle.assertEquivalent(
      df.agg(count(lit(1)).cast("double").as("cnt")),
      "SELECT CAST(COUNT(*) AS DOUBLE) AS cnt FROM t",
      "t" -> df)
  }

  test("rejects a wrong value") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.agg((count(lit(1)) + 1).cast("double").as("cnt")),
        "SELECT CAST(COUNT(*) AS DOUBLE) AS cnt FROM t",
        "t" -> df)
    }
  }

  test("rejects mismatched column names") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.agg(count(lit(1)).cast("double").as("wrong")),
        "SELECT CAST(COUNT(*) AS DOUBLE) AS cnt FROM t",
        "t" -> df)
    }
  }

  test("rejects missing rows") {
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.filter(col("k") =!= 2).select(col("k").cast("double").as("k")),
        "SELECT CAST(k AS DOUBLE) AS k FROM t",
        "t" -> df)
    }
  }

  test("accepts multi-row, multi-column equivalence") {
    Oracle.assertEquivalent(
      df.select(col("k").cast("double").as("k"), col("v")),
      "SELECT CAST(k AS DOUBLE) AS k, v FROM t",
      "t" -> df)
  }
}
