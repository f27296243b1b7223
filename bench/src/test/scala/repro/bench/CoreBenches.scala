package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp._

/** Table T1 (fig. 2): USS inclusion probabilities ≈ thresholded PPS. */
class E1InclusionBench extends AnyFunSuite {
  test("T1: empirical inclusion probabilities match the PPS curve") {
    val rep = E1Inclusion.run()
    println(rep.table)
    // Paper: the empirical curve sits on the theoretical one (fig. 2).
    assert(rep.maxAbsDiff < 0.08, s"max |empirical-theoretical| = ${rep.maxAbsDiff}")
    // Inclusion must rise monotonically with the theoretical probability.
    val pis = rep.rows.map(_.empiricalPi)
    assert(pis == pis.sorted, s"empirical inclusion not monotone: $pis")
    // Frequent items (pi = 1 bucket) are always in the sketch.
    assert(rep.rows.last.empiricalPi > 0.995)
  }
}

/** Table T2 (fig. 3): accuracy improves with skew and with subset size. */
class E2SkewBench extends AnyFunSuite {
  test("T2: RRMSE falls with subset size and with data skew") {
    val rep = E2Skew.run()
    println(rep.table)
    // Within every shape, the largest-truth tercile beats the smallest.
    Seq(0.25, 0.5, 1.0).foreach { shape =>
      assert(rep.rrmseOf(shape, 2) < rep.rrmseOf(shape, 0),
        s"shape $shape: large subsets should be easier")
    }
    // Across shapes, the most skewed data gives the best large-subset accuracy.
    assert(rep.rrmseOf(0.25, 2) < rep.rrmseOf(1.0, 2),
      "higher skew should improve large-subset accuracy")
  }
}

/** Table T3 (fig. 4): USS ≫ uniform item sampling on skewed data. */
class E3BottomKBench extends AnyFunSuite {
  test("T3: bottom-k errors are a large multiple of USS errors") {
    val rep = E3BottomK.run()
    println(rep.table)
    assert(rep.overallRatio > 3.0, s"expected bottom-k ≫ USS, ratio=${rep.overallRatio}")
    rep.rows.foreach { r =>
      assert(r.bottomKRrmse > r.ussRrmse, s"USS must win in every bucket: $r")
    }
  }
}

/** Table T4 (fig. 5): USS matches priority sampling despite raw input. */
class E4PriorityBench extends AnyFunSuite {
  test("T4: USS is competitive with pre-aggregated priority sampling") {
    val rep = E4Priority.run()
    println(rep.table)
    // Paper: USS performs "slightly better"; we accept parity within 30%.
    assert(rep.overallRatio < 1.3,
      s"USS should match priority sampling, USS/priority=${rep.overallRatio}")
  }
}

/** Table T6 (fig. 7): two-half pathological stream — DSS fails, USS ≈ PPS. */
class E6PathologicalBench extends AnyFunSuite {
  test("T6: DSS ignores the first half while USS keeps PPS behaviour") {
    val rep = E6Pathological.run()
    println(rep.table)
    // USS inclusion tracks the PPS curve on first-half items.
    val meanDiff = repro.exp.Exp.mean(rep.inclusion.map(r => math.abs(r.ussPi - r.theoreticalPi)))
    assert(meanDiff < 0.1, s"USS inclusion drifts from PPS: $meanDiff")
    // DSS keeps almost no non-frequent first-half items.
    val lowDeciles = rep.inclusion.take(8)
    assert(repro.exp.Exp.mean(lowDeciles.map(_.dssPi)) < 0.05,
      "DSS should drop almost all infrequent first-half items")
    // Error: over all first-half items DSS is worse and negatively biased;
    // over the infrequent 90% it is catastrophically wrong (estimates ~0).
    val all = rep.error("all")
    val tail = rep.error("tail")
    assert(all.dssRrmse > 1.5 * all.ussRrmse, s"all-scope: DSS=${all.dssRrmse} USS=${all.ussRrmse}")
    assert(all.dssBias < -0.4, s"DSS bias ${all.dssBias} should be strongly negative")
    assert(math.abs(all.ussBias) < 0.1, s"USS bias ${all.ussBias} should be near zero")
    assert(tail.dssRrmse > 0.95 && tail.dssBias < -0.95,
      s"DSS should estimate ~0 on infrequent first-half subsets: $tail")
    assert(tail.dssRrmse > 1.3 * tail.ussRrmse, s"tail-scope: DSS=${tail.dssRrmse} USS=${tail.ussRrmse}")
    assert(math.abs(tail.ussBias) < 0.15, s"USS tail bias ${tail.ussBias} should be near zero")
  }
}

/** Tables T7+T8 (figs. 8-10): sorted-stream variance, coverage, DSS failure. */
class E7VarianceBench extends AnyFunSuite {
  private lazy val rep = E7Variance.run()

  test("T7: eq.5 variance is accurate-to-conservative and CIs cover") {
    println(rep.varianceTable)
    // Estimates are unbiased per epoch (within 5 sd of the Monte Carlo mean).
    rep.varianceRows.foreach { r =>
      val se = r.trueSd / math.sqrt(300)
      assert(math.abs(r.meanEst - r.truth) < 5 * se + 1e-6, s"epoch ${r.epoch} biased: $r")
    }
    // The eq.5 sd does not underestimate badly where sampling noise dominates.
    rep.varianceRows.filter(r => r.trueSd > 0 && r.coverage < 1.0).foreach { r =>
      assert(r.estSd > 0.5 * r.trueSd, s"epoch ${r.epoch}: estSd=${r.estSd} trueSd=${r.trueSd}")
    }
    // Coverage at or above ~advertised in the CLT regime (many sampled items).
    val cltEpochs = rep.varianceRows.filter(_.meanItems >= 15)
    assert(cltEpochs.nonEmpty)
    cltEpochs.foreach { r =>
      assert(r.coverage >= 0.85, s"epoch ${r.epoch} coverage ${r.coverage}")
    }
  }

  test("T8: DSS gives wildly wrong epoch sums while USS stays accurate") {
    println(rep.errorTable)
    // DSS estimates 0 for the first nine epochs (RRMSE = 1, i.e. 100% error).
    rep.errorRows.take(9).foreach(r =>
      assert(math.abs(r.dssRrmse - 1.0) < 1e-9, s"epoch ${r.epoch}: ${r.dssRrmse}"))
    // Wherever an epoch carries ≥1% of the mass, USS wins by a clear factor
    // (the paper reports ~50x at its much larger n/m scale).
    rep.errorRows.filter(_.truthFrac >= 0.01).foreach { r =>
      assert(r.dssRrmse > 2 * r.ussRrmse, s"epoch ${r.epoch}: DSS=${r.dssRrmse} USS=${r.ussRrmse}")
    }
    // The heaviest epoch shows the largest gap.
    val last = rep.errorRows.last
    assert(last.dssRrmse > 5 * last.ussRrmse, s"epoch 10: DSS=${last.dssRrmse} USS=${last.ussRrmse}")
    // Paper's caveat: for extremely small counts the possibility of
    // overestimation makes USS worse than DSS's 0 estimate.
    assert(rep.errorRows.head.ussRrmse > rep.errorRows.head.dssRrmse,
      "tiniest epoch should reproduce the paper's small-count caveat")
  }
}

/** Table T9 (§5.5): distributed sketching with the three merges. */
class E9MergeBench extends AnyFunSuite {
  test("T9: unbiased merges track the single-pass sketch; MG merge biases the tail") {
    val rep = E9Merge.run()
    println(rep.table)
    assert(rep("single-pass").totalRelErr < 1e-12)
    assert(rep("pairwise").totalRelErr < 1e-12, "pairwise merge must preserve totals exactly")
    assert(rep("priority").totalRelErr < 0.05, "priority merge preserves totals in expectation")
    // Merged accuracy stays within a small factor of single-pass.
    Seq("pairwise", "priority").foreach { m =>
      assert(rep(m).rrmse < 2.5 * rep("single-pass").rrmse, s"$m merge too lossy: ${rep(m)}")
      assert(math.abs(rep(m).tailRelBias) < 0.1, s"$m merge biased on the tail: ${rep(m)}")
    }
    // The deterministic merge loses tail mass (figure 1 discussion).
    assert(rep("misra-gries").tailRelBias < -0.3,
      s"MG merge should bias the tail down, got ${rep("misra-gries").tailRelBias}")
  }
}
