package repro

import org.apache.spark.sql.functions._

/** Sanity checks for the DuckDB oracle itself: it must accept equivalent
  * results and reject wrong ones — otherwise every oracle-based test in
  * repro.dist is vacuous.
  */
class OracleSpec extends SparkSpec {

  private lazy val df = {
    import spark.implicits._
    Seq((1L, "a"), (2L, "b"), (3L, "a")).toDF("id", "token")
  }

  test("accepts an equivalent aggregation") {
    val agg = df.groupBy("token").agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(agg,
      "SELECT token, COUNT(*) AS n FROM t GROUP BY token",
      "t" -> df)
  }

  test("rejects a wrong result") {
    val wrong = df.groupBy("token").agg((count(lit(1)) + 1).as("n"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT token, COUNT(*) AS n FROM t GROUP BY token",
        "t" -> df)
    }
  }

  test("rejects mismatched column names") {
    val agg = df.groupBy("token").agg(count(lit(1)).as("wrongname"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(agg,
        "SELECT token, COUNT(*) AS n FROM t GROUP BY token",
        "t" -> df)
    }
  }

  test("handles doubles up to 1e-6 canonicalization") {
    import spark.implicits._
    val d = Seq((1L, 0.1 + 0.2)).toDF("id", "v") // fp noise vs literal 0.3
    Oracle.assertEquivalent(d, "SELECT 1 AS id, 0.3 AS v", "t" -> d)
  }

  test("handles nulls") {
    import spark.implicits._
    val d = Seq((1L, Option.empty[String]), (2L, Some("x"))).toDF("id", "s")
    Oracle.assertEquivalent(d, "SELECT id, s FROM t", "t" -> d)
  }
}
