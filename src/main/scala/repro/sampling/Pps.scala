package repro.sampling

import repro.core.{Entry, Estimate}
import scala.util.Random

/** Probability-proportional-to-size sampling utilities (§5.1).
  *
  *  - `inclusionProbabilities`: the thresholded PPS marginals
  *    π_i = min(1, α·w_i) with α chosen (water-filling) so Σ π_i = k.
  *    These are the theoretical curves of figure 2.
  *  - `poissonSample`: independent Bernoulli(π_i) draws with HT adjustment,
  *    plus the closed-form variance Σ w_i²(1−π_i)/π_i used as the PPS
  *    reference line in figure 9.
  *  - `systematicSample`: fixed-size PPS with exact marginals π via
  *    systematic sampling on a randomly permuted order — a member of the
  *    Deville–Tillé (1998) splitting family referenced in §5.1/§5.5.
  */
object Pps {

  /** Water-filling solve of Σ min(1, α·w_i) = k (all probabilities 1 when
    * k ≥ #items). Returns probabilities aligned with `weights`.
    */
  def inclusionProbabilities(weights: Seq[Double], k: Int): Array[Double] = {
    require(k > 0, s"sample size must be positive, got $k")
    weights.foreach(w => require(w > 0, s"weights must be positive, got $w"))
    val n = weights.size
    if (k >= n) return Array.fill(n)(1.0)
    // Sort descending; peel off certainty items while α·w > 1.
    val idx = weights.indices.sortBy(i => -weights(i))
    val sorted = idx.map(weights)
    val suffix = new Array[Double](n + 1)
    for (i <- n - 1 to 0 by -1) suffix(i) = suffix(i + 1) + sorted(i)
    var certain = 0
    // With `certain` items forced to 1, remaining budget k−certain spreads as
    // α = (k−certain)/Σ_rest; the split is valid once α·w_certain+1 ≤ 1.
    while (certain < k && (k - certain) * sorted(certain) > suffix(certain)) certain += 1
    val alpha = (k - certain).toDouble / suffix(certain)
    val pis = new Array[Double](n)
    for (j <- 0 until n) {
      val orig = idx(j)
      pis(orig) = if (j < certain) 1.0 else math.min(1.0, alpha * sorted(j))
    }
    pis
  }

  /** The threshold α itself (π_i = min(1, α·w_i)). */
  def alpha(weights: Seq[Double], k: Int): Double = {
    val pis = inclusionProbabilities(weights, k)
    val i = pis.indexWhere(_ < 1.0)
    if (i < 0) Double.PositiveInfinity else pis(i) / weights(i)
  }

  /** Poisson (independent Bernoulli) PPS sample with HT-adjusted weights. */
  def poissonSample[T](items: Seq[(T, Double)], k: Int, seed: Long): Vector[Entry[T]] = {
    val pis = inclusionProbabilities(items.map(_._2), k)
    val rng = repro.core.Rng(seed)
    items.iterator.zipWithIndex.flatMap { case ((i, w), j) =>
      if (rng.nextDouble() < pis(j)) Some(Entry(i, w / pis(j))) else None
    }.toVector
  }

  /** Exact variance of the Poisson PPS HT estimator for the subset selected
    * by `pred`: Σ_{i∈S} w_i²·(1−π_i)/π_i.
    */
  def poissonVariance[T](items: Seq[(T, Double)], k: Int)(pred: T => Boolean): Double = {
    val pis = inclusionProbabilities(items.map(_._2), k)
    items.iterator.zipWithIndex.collect { case ((i, w), j) if pred(i) =>
      w * w * (1 - pis(j)) / pis(j)
    }.sum
  }

  /** Fixed-size PPS sample (exactly k items) with exact marginals π_i, via
    * systematic sampling over a uniformly random item order.
    */
  def systematicSample[T](items: Seq[(T, Double)], k: Int, seed: Long): Vector[Entry[T]] = {
    val rng = repro.core.Rng(seed)
    val perm = rng.shuffle(items.toVector)
    val pis = inclusionProbabilities(perm.map(_._2), k)
    val u = rng.nextDouble()
    val out = Vector.newBuilder[Entry[T]]
    var cum = 0.0
    var nextTick = u
    for (((item, w), j) <- perm.zipWithIndex) {
      val hi = cum + pis(j)
      while (nextTick < hi) {
        out += Entry(item, w / pis(j))
        nextTick += 1.0
      }
      cum = hi
    }
    out.result()
  }

  /** Subset-sum estimate from any HT-adjusted entry set. */
  def subsetSum[T](entries: Seq[Entry[T]])(pred: T => Boolean): Estimate = {
    var s = 0.0
    entries.foreach(e => if (pred(e.item)) s += e.count)
    Estimate(s, 0.0)
  }
}
