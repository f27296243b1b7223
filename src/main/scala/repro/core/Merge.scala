package repro.core

import scala.collection.mutable
import scala.util.Random

/** Merge / size-reduction operations for Space Saving sketches (§5.3, §5.5).
  *
  * All merges first combine bins exactly (summing counts for shared labels —
  * an exact, lossless step) and then, if more than m bins remain, apply a
  * *reduction operation*. Theorem 2: any reduction whose post-reduction
  * expected counts equal the pre-reduction counts keeps the sketch unbiased
  * for disaggregated subset sums. Two unbiased reductions and the biased
  * deterministic one are provided:
  *
  *  - `pairwiseUnbiased`: repeatedly PPS-collapse the two smallest bins (the
  *    label survives with probability proportional to its count). This is the
  *    same reduction Unbiased Space Saving applies on every stream update, so
  *    it preserves the total weight *exactly* while staying unbiased.
  *  - `prioritySampled`: one-shot priority-sampling reduction with
  *    Horvitz-Thompson adjusted counts `max(c_i, 1/τ)` (§5.5 suggests
  *    "replacing the pairwise randomization with priority sampling"). Unbiased
  *    per item, but the total is only preserved in expectation.
  *  - `misraGries`: the deterministic Agarwal et al. soft-threshold merge —
  *    biased downward, kept as the comparison point of figure 1.
  */
object Merge {

  /** Exact bin combination: per-label count sums and the summed total weight. */
  def combine[T](sketches: Seq[SketchSummary[T]]): (mutable.HashMap[T, Double], Double) = {
    val acc = mutable.HashMap.empty[T, Double]
    var total = 0.0
    sketches.foreach { s =>
      total += s.total
      s.entries.foreach { e =>
        acc.updateWith(e.item) { case Some(c) => Some(c + e.count); case None => Some(e.count) }
      }
    }
    (acc, total)
  }

  /** Unbiased, total-preserving merge via repeated two-smallest-bin PPS
    * collapse. Returns a live sketch that can keep ingesting rows.
    */
  def pairwiseUnbiased[T](m: Int, seed: Long, sketches: Seq[SketchSummary[T]]): UnbiasedSpaceSaving[T] = {
    val (acc, total) = combine(sketches)
    val rng = repro.core.Rng(seed)
    // Min-heap of (count, insertion-tiebreak, item).
    implicit val ord: Ordering[(Double, Long, T)] = Ordering.by(e => (-e._1, -e._2))
    val pq = mutable.PriorityQueue.empty[(Double, Long, T)]
    acc.foreach { case (i, c) => pq.enqueue((c, rng.nextLong(), i)) }
    while (pq.size > m) {
      val (c1, _, i1) = pq.dequeue()
      val (c2, _, i2) = pq.dequeue()
      val c = c1 + c2
      val keep = if (rng.nextDouble() < c1 / c) i1 else i2
      pq.enqueue((c, rng.nextLong(), keep))
    }
    val entries = Vector.newBuilder[Entry[T]]
    while (pq.nonEmpty) { val (c, _, i) = pq.dequeue(); entries += Entry(i, c) }
    UnbiasedSpaceSaving.fromEntries(m, rng.nextLong(), entries.result(), total)
  }

  /** Unbiased merge via a priority-sampling reduction: keep the m bins with
    * the smallest priorities U_i/c_i, Horvitz-Thompson adjust survivors to
    * `max(c_i, 1/τ)` with τ the (m+1)-th smallest priority.
    */
  def prioritySampled[T](m: Int, seed: Long, sketches: Seq[SketchSummary[T]]): UnbiasedSpaceSaving[T] = {
    val (acc, total) = combine(sketches)
    val rng = repro.core.Rng(seed)
    val entries: Seq[Entry[T]] =
      if (acc.size <= m) acc.iterator.map { case (i, c) => Entry(i, c) }.toVector
      else {
        val prioritized = acc.iterator.map { case (i, c) =>
          val u = math.max(rng.nextDouble(), Double.MinPositiveValue)
          (u / c, i, c)
        }.toArray.sortBy(_._1)
        val tau = prioritized(m)._1
        prioritized.take(m).iterator.map { case (_, i, c) => Entry(i, math.max(c, 1.0 / tau)) }.toVector
      }
    UnbiasedSpaceSaving.fromEntries(m, rng.nextLong(), entries, total)
  }

  /** Deterministic biased merge: soft-threshold combined counts by the
    * (m+1)-th largest so at most m nonzero counters remain (§5.5).
    */
  def misraGries[T](m: Int, sketches: Seq[SketchSummary[T]]): SketchSummary[T] = {
    val (acc, total) = combine(sketches)
    val entries =
      if (acc.size <= m) acc.iterator.map { case (i, c) => Entry(i, c) }.toVector
      else {
        val theta = acc.valuesIterator.toArray.sortBy(-_).apply(m)
        acc.iterator.collect { case (i, c) if c - theta > 0 => Entry(i, c - theta) }.toVector
      }
    SketchSummary(entries, 0.0, total, m)
  }
}
