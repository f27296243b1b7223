package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil._

class EstimateSpec extends AnyFunSuite {

  test("normal quantile matches known values") {
    assert(math.abs(Estimate.normalQuantile(0.5)) < 1e-8)
    assert(math.abs(Estimate.normalQuantile(0.975) - 1.959964) < 1e-5)
    assert(math.abs(Estimate.normalQuantile(0.025) + 1.959964) < 1e-5)
    assert(math.abs(Estimate.normalQuantile(0.995) - 2.575829) < 1e-5)
    assert(math.abs(Estimate.normalQuantile(0.84) - 0.994458) < 1e-5)
    assert(math.abs(Estimate.normalQuantile(0.0001) + 3.719016) < 1e-4)
  }

  test("normal quantile rejects levels outside (0,1)") {
    assertThrows[IllegalArgumentException](Estimate.normalQuantile(0.0))
    assertThrows[IllegalArgumentException](Estimate.normalQuantile(1.0))
  }

  test("stddev is the square root of the variance") {
    assert(Estimate(10.0, 25.0).stddev == 5.0)
  }

  test("ci95 is symmetric around the value with the 1.96 width") {
    val e = Estimate(100.0, 16.0)
    val (lo, hi) = e.ci95
    assert(math.abs((lo + hi) / 2 - 100.0) < 1e-9)
    assert(math.abs(hi - 100.0 - 1.959964 * 4.0) < 1e-4)
  }

  test("wider confidence level gives wider interval") {
    val e = Estimate(0.0, 1.0)
    val (lo95, hi95) = e.ci(0.95)
    val (lo99, hi99) = e.ci(0.99)
    assert(lo99 < lo95 && hi99 > hi95)
  }

  test("covers is true exactly inside the interval") {
    val e = Estimate(50.0, 4.0) // sd 2, 95% half-width ~3.92
    assert(e.covers(50.0))
    assert(e.covers(53.0))
    assert(!e.covers(55.0))
    assert(!e.covers(45.0))
  }

  test("zero-variance estimate covers only its own value") {
    val e = Estimate(7.0, 0.0)
    assert(e.covers(7.0))
    assert(!e.covers(7.001))
  }
}

class SketchSummarySpec extends AnyFunSuite {

  private val s = SketchSummary(
    Vector(Entry("a", 50.0), Entry("b", 30.0), Entry("c", 10.0), Entry("d", 10.0)),
    minCount = 10.0, total = 100.0, m = 4)

  test("estimate and contains agree with the entry list") {
    assert(s.estimate("a") == 50.0)
    assert(s.estimate("zz") == 0.0)
    assert(s.contains("c") && !s.contains("zz"))
  }

  test("subsetSum adds matching entries") {
    assert(s.subsetSumOf(Set("a", "c")).value == 60.0)
    assert(s.subsetSum(_ => true).value == 100.0)
    assert(s.subsetSumOf(Set.empty[String]).value == 0.0)
  }

  test("eq.5 variance: N̂_min² times the number of matching bins, floored at one") {
    assert(s.subsetSumOf(Set("a", "c")).variance == 10.0 * 10.0 * 2)
    assert(s.subsetSumOf(Set("a")).variance == 100.0)
    // Empty subsets still get the worst-case single-item variance C_S = 1.
    assert(s.subsetSumOf(Set("zz")).variance == 100.0)
  }

  test("frequentItems applies the relative threshold") {
    assert(s.frequentItems(0.25).map(_.item) == Vector("a", "b"))
    assert(s.frequentItems(0.45).map(_.item) == Vector("a"))
    assert(s.frequentItems(0.6).isEmpty)
    assertThrows[IllegalArgumentException](s.frequentItems(0.0))
  }

  test("topK returns the largest bins in order") {
    assert(s.topK(2).map(_.item) == Vector("a", "b"))
    assert(s.topK(10).size == 4)
    assert(s.topK(0).isEmpty)
  }

  test("size reports occupied bins") {
    assert(s.size == 4)
  }
}

class VarianceEstimatorSpec extends AnyFunSuite {

  /** Build many independent sketches over the same skewed stream and check
    * eq.-5 behaviour end to end.
    */
  private def replicate(reps: Int, m: Int, counts: Seq[Long], subset: Set[Int], seedBase: Long) = {
    (0 until reps).map { r =>
      val s = UnbiasedSpaceSaving[Int](m, seedBase + 2 * r)
      s.updateAll(shuffledStream(counts, seedBase + 2 * r + 1))
      s.summary.subsetSumOf(subset)
    }
  }

  // Skewed counts: a few hundred tail items plus some heavies.
  private val counts: Seq[Long] =
    (1 to 300).map(_ => 2L) ++ (1 to 30).map(_ => 20L) ++ Seq(200L, 300L)
  private val truthAll = counts.map(_.toDouble)

  test("eq.5 variance is upward biased on i.i.d. streams (paper §6.4)") {
    val subset = (0 until 300 by 3).toSet // 100 tail items
    val truth = subset.toSeq.map(truthAll(_)).sum
    val est = replicate(600, 40, counts, subset, 11000)
    val trueVar = variance(est.map(_.value))
    val meanEstVar = mean(est.map(_.variance))
    assert(meanEstVar >= 0.7 * trueVar,
      s"estimated variance $meanEstVar should not be far below true variance $trueVar")
    assertUnbiased(est.map(_.value), truth, z = 4.5, label = "subset value")
  }

  test("95% normal intervals cover at close to or above the advertised rate (paper §6.5)") {
    val subset = (0 until 330).toSet // all tail + mid items: large subset, CLT applies
    val truth = subset.toSeq.map(truthAll(_)).sum
    val est = replicate(600, 40, counts, subset, 17000)
    val coverage = est.count(_.covers(truth)).toDouble / est.size
    assert(coverage >= 0.88, s"coverage $coverage below advertised 95% minus tolerance")
  }

  test("variance estimate shrinks as bins grow") {
    val subset = (0 until 300 by 3).toSet
    val small = replicate(50, 40, counts, subset, 23000)
    val big = replicate(50, 200, counts, subset, 29000)
    assert(mean(big.map(_.variance)) < mean(small.map(_.variance)),
      "more bins must reduce the estimated variance")
  }
}
