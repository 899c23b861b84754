package repro

import org.apache.spark.sql.functions._

/** Sanity checks of the DuckDB oracle harness itself. */
class OracleSpec extends SparkSpec {

  test("oracle accepts an equivalent aggregation") {
    import spark.implicits._
    val df = Seq((1, 10.0), (1, 20.0), (2, 5.0)).toDF("k", "x")
    val sparkAgg = df.groupBy("k").agg(sum("x") as "total")
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT CAST(k AS INT) AS k, sum(CAST(x AS DOUBLE)) AS total FROM t GROUP BY k",
      "t" -> df)
  }

  test("oracle rejects a wrong result") {
    import spark.implicits._
    val df = Seq((1, 10.0), (2, 5.0)).toDF("k", "x")
    val wrong = df.groupBy("k").agg((sum("x") + 1) as "total")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT CAST(k AS INT) AS k, sum(CAST(x AS DOUBLE)) AS total FROM t GROUP BY k",
        "t" -> df)
    }
  }

  test("oracle rejects mismatched column sets") {
    import spark.implicits._
    val df = Seq((1, 2.0)).toDF("k", "x")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df.select(col("k") as "wrong"),
        "SELECT k FROM t", "t" -> df)
    }
  }
}
