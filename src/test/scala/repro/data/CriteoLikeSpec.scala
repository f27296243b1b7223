package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}

class CriteoLikeSpec extends SparkSpec {

  private lazy val df = SynthData.criteoLike(spark, sf = 2e-4, seed = 7).cache()

  test("schema: nine categorical features plus a click flag") {
    assert(df.columns.toSeq == (1 to 9).map(i => s"c$i") :+ "click")
  }

  test("row count scales with sf") {
    assert(df.count() == (45e6 * 2e-4).toLong)
  }

  test("feature cardinalities are bounded by the declared cardinalities") {
    SynthData.CriteoCardinalities.zipWithIndex.foreach { case (card, i) =>
      val distinct = df.select(s"c${i + 1}").distinct().count()
      assert(distinct <= card, s"c${i + 1} has $distinct > $card values")
    }
  }

  test("feature values are skewed: the top value dominates a uniform share") {
    val top = df.groupBy("c9").count().orderBy(desc("count")).head().getLong(1)
    assert(top > df.count() / SynthData.CriteoCardinalities(8) * 5)
  }

  test("click flag is 0/1 with a plausible overall rate") {
    val rates = df.agg(avg("click")).head().getDouble(0)
    assert(rates > 0.01 && rates < 0.4, s"click rate $rates out of range")
    assert(df.select("click").distinct().collect().map(_.getInt(0)).toSet.subsetOf(Set(0, 1)))
  }

  test("generation is deterministic in (sf, seed)") {
    val again = SynthData.criteoLike(spark, sf = 2e-4, seed = 7)
    val a = df.groupBy("c1", "c5", "click").count()
    val b = again.groupBy("c1", "c5", "click").count()
    assert(a.exceptAll(b).isEmpty && b.exceptAll(a).isEmpty)
  }

  test("one-way marginal counts match the DuckDB oracle") {
    val marginal = df.groupBy("c2").agg(count(lit(1)).as("n")).select(col("c2"), col("n").cast("double").as("n"))
    Oracle.assertEquivalent(marginal,
      "SELECT c2, CAST(count(*) AS DOUBLE) AS n FROM impressions GROUP BY c2",
      "impressions" -> df)
  }

  test("two-way marginal counts match the DuckDB oracle") {
    val marginal = df.groupBy("c1", "c4").agg(count(lit(1)).as("n"))
      .select(col("c1"), col("c4"), col("n").cast("double").as("n"))
    Oracle.assertEquivalent(marginal,
      "SELECT c1, c4, CAST(count(*) AS DOUBLE) AS n FROM impressions GROUP BY c1, c4",
      "impressions" -> df)
  }

  test("clicks-per-feature aggregation matches the DuckDB oracle") {
    val clicks = df.groupBy("c3").agg(sum("click").cast("double").as("clicks"))
    Oracle.assertEquivalent(clicks,
      "SELECT c3, CAST(sum(CAST(click AS INT)) AS DOUBLE) AS clicks FROM impressions GROUP BY c3",
      "impressions" -> df)
  }
}
