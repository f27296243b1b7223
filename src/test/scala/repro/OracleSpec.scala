package repro

import org.apache.spark.sql.functions._

/** Meta-tests: the DuckDB oracle itself must detect both agreement and
  * disagreement, otherwise every oracle-based test is vacuous.
  */
class OracleSpec extends SparkSpec {
  import spark.implicits._

  private lazy val df = Seq(("a", 1.0), ("a", 2.0), ("b", 4.0)).toDF("k", "v").cache()

  test("accepts a matching aggregation") {
    val agg = df.groupBy("k").agg(sum("v").as("s"))
    Oracle.assertEquivalent(agg,
      "SELECT k, CAST(sum(CAST(v AS DOUBLE)) AS DOUBLE) AS s FROM t GROUP BY k",
      "t" -> df)
  }

  test("rejects a wrong aggregation") {
    val wrong = df.groupBy("k").agg((sum("v") + 1).as("s"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT k, CAST(sum(CAST(v AS DOUBLE)) AS DOUBLE) AS s FROM t GROUP BY k",
        "t" -> df)
    }
  }

  test("rejects mismatched column names") {
    val agg = df.groupBy("k").agg(sum("v").as("wrong_name"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(agg,
        "SELECT k, CAST(sum(CAST(v AS DOUBLE)) AS DOUBLE) AS s FROM t GROUP BY k",
        "t" -> df)
    }
  }

  test("rejects missing rows") {
    val filtered = df.filter($"k" === "a").groupBy("k").agg(sum("v").as("s"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(filtered,
        "SELECT k, CAST(sum(CAST(v AS DOUBLE)) AS DOUBLE) AS s FROM t GROUP BY k",
        "t" -> df)
    }
  }
}
