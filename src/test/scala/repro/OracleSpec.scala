package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the DuckDB oracle itself, so a broken oracle cannot
  * silently validate broken pipelines.
  */
class OracleSpec extends SparkSpec {

  import spark.implicits._

  private lazy val df = Seq(
    (1L, "a", 10.0), (2L, "a", 20.0), (3L, "b", 30.0),
  ).toDF("id", "k", "v")

  test("accepts a correct aggregate") {
    val got = df.groupBy("k").agg(sum("v").as("s"), count(lit(1)).as("n"))
    Oracle.assertEquivalent(
      got,
      "SELECT k, sum(CAST(v AS DOUBLE)) AS s, count(*) AS n FROM t GROUP BY k",
      "t" -> df,
    )
  }

  test("rejects a wrong result") {
    val wrong = df.groupBy("k").agg((sum("v") + 1).as("s"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT k, sum(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k",
        "t" -> df,
      )
    }
  }

  test("rejects a column-name mismatch") {
    val got = df.groupBy("k").agg(sum("v").as("wrong_name"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        got,
        "SELECT k, sum(CAST(v AS DOUBLE)) AS s FROM t GROUP BY k",
        "t" -> df,
      )
    }
  }

  test("handles nulls") {
    // Oracle tables are all-VARCHAR; CAST restores numeric semantics and
    // preserves NULLs.
    val withNull = Seq((1L, Some(1.0)), (2L, None)).toDF("id", "v")
    Oracle.assertEquivalent(
      withNull.select("id", "v"),
      "SELECT id, CAST(v AS DOUBLE) AS v FROM t",
      "t" -> withNull,
    )
  }
}
