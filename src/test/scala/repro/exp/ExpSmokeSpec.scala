package repro.exp

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

/** Tiny-parameter smoke runs of every pure-JVM table harness: the full-size
  * runs (with shape assertions against the paper) live in bench/.
  */
class ExpSmokeSpec extends AnyFunSuite {

  test("E1 inclusion harness produces buckets that cover theory and experiment") {
    val rep = E1Inclusion.run(nItems = 100, targetTotal = 5000L, m = 20, reps = 20, seed = 1)
    assert(rep.rows.nonEmpty)
    rep.rows.foreach { r =>
      assert(r.theoreticalPi >= 0 && r.theoreticalPi <= 1)
      assert(r.empiricalPi >= 0 && r.empiricalPi <= 1)
    }
    assert(rep.table.contains("T1"))
  }

  test("E2 skew harness produces one tercile row per shape") {
    val rep = E2Skew.run(nItems = 150, shapes = Seq(0.5, 1.0), targetTotal = 5000L,
      m = 30, subsetSize = 20, nSubsets = 6, reps = 10, seed = 2)
    assert(rep.rows.size == 6)
    rep.rows.foreach(r => assert(r.rrmse >= 0))
  }

  test("E3 bottom-k harness reports finite ratios") {
    val rep = E3BottomK.run(nItems = 150, targetTotal = 5000L, m = 20, subsetSize = 20,
      nSubsets = 6, reps = 10, seed = 3)
    assert(rep.rows.size == 3)
    assert(rep.overallRatio > 0 && !rep.overallRatio.isNaN)
  }

  test("E4 priority harness reports finite ratios") {
    val rep = E4Priority.run(nItems = 150, targetTotal = 5000L, m = 30, subsetSize = 20,
      nSubsets = 6, reps = 10, seed = 4)
    assert(rep.rows.size == 3)
    assert(rep.overallRatio > 0 && !rep.overallRatio.isNaN)
  }

  test("E6 pathological harness reports ten deciles and an error row") {
    val rep = E6Pathological.run(nItemsPerHalf = 100, targetTotalPerHalf = 3000L, m = 20,
      subsetSize = 20, nSubsets = 5, reps = 15, seed = 5)
    assert(rep.inclusion.size == 10)
    assert(rep.errors.map(_.scope) == Vector("all", "tail"))
    rep.errors.foreach(e => assert(e.ussRrmse >= 0 && e.dssRrmse >= 0))
  }

  test("E7 variance harness reports one row per epoch in both tables") {
    val rep = E7Variance.run(nItems = 200, targetTotal = 8000L, m = 40, nEpochs = 10,
      reps = 20, seed = 6)
    assert(rep.varianceRows.size == 10)
    assert(rep.errorRows.size == 10)
    rep.varianceRows.foreach { r =>
      assert(r.coverage >= 0 && r.coverage <= 1)
      assert(r.estSd >= 0 && r.ppsSd >= 0)
    }
  }

  test("E9 merge harness reports all four methods") {
    val rep = E9Merge.run(nItems = 200, targetTotal = 8000L, m = 40, shards = 4,
      subsetSize = 20, nSubsets = 5, reps = 10, seed = 7)
    assert(rep.rows.map(_.method).toSet ==
      Set("single-pass", "pairwise", "priority", "misra-gries"))
    assert(rep("pairwise").totalRelErr < 1e-9, "pairwise merge must preserve totals exactly")
    assert(rep("single-pass").totalRelErr < 1e-9)
  }
}

/** Spark-backed smoke runs for the two Spark-native harnesses. */
class ExpSparkSmokeSpec extends SparkSpec {

  test("E5 criteo harness produces size-bucketed rows") {
    val rep = E5Criteo.run(spark, sf = 2e-4, m = 512, seeds = 1, minFrac = 2e-3, seed = 8)
    assert(rep.rows.nonEmpty)
    rep.rows.foreach(r => assert(r.ussRrmse >= 0 && r.priorityRrmse >= 0))
  }

  test("E10 tpch harness produces one row per method") {
    val rep = E10Tpch.run(spark, sf = 0.005, m = 256, seeds = 1, nFilters = 5, seed = 9)
    assert(rep.rows.map(_.method) == Vector("uss", "priority", "bottom-k"))
    rep.rows.foreach(r => assert(r.rrmse >= 0 && !r.rrmse.isNaN))
  }
}
