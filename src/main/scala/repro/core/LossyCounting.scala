package repro.core

import scala.collection.mutable

/** Baseline: simplified Lossy Counting (Manku & Motwani), as described in
  * §5.2 of the paper: counters are decremented by 1 on a fixed schedule —
  * after every window of m rows — rather than adaptively. Items whose true
  * frequency exceeds n_tot/m are guaranteed to survive; any counter
  * under-estimates its item's count by at most the number of completed
  * windows ⌈t/m⌉. Unlike Misra-Gries the live-counter set is not bounded by
  * m (worst case O(m log(t/m))).
  */
final class LossyCounting[T](val m: Int) extends Serializable {
  require(m > 0, s"window size must be positive, got m=$m")

  private val counters = mutable.HashMap.empty[T, Long]
  private var rows = 0L
  private var windows = 0L

  /** Rows processed. */
  def totalCount: Long = rows

  /** Completed decrement windows — the maximum undercount of any estimate. */
  def completedWindows: Long = windows

  def size: Int = counters.size

  /** Under-biased estimate (0 ≤ n_i − N̂_i ≤ completedWindows). */
  def estimate(item: T): Long = counters.getOrElse(item, 0L)

  /** Upper-bound estimate, recovering the Space-Saving-style count (§5.2:
    * "the original Lossy counting algorithm is recovered by adding the number
    * of decrements back to any nonzero counter").
    */
  def upperBound(item: T): Long =
    counters.get(item).map(_ + windows).getOrElse(0L)

  def contains(item: T): Boolean = counters.contains(item)

  def update(item: T): Unit = {
    counters.updateWith(item) { case Some(c) => Some(c + 1L); case None => Some(1L) }
    rows += 1
    if (rows % m == 0) {
      windows += 1
      counters.filterInPlace((_, c) => c > 1L)
      counters.mapValuesInPlace((_, c) => c - 1L)
    }
  }

  def updateAll(items: IterableOnce[T]): Unit = items.iterator.foreach(update)

  def summary: SketchSummary[T] =
    SketchSummary(counters.iterator.map { case (i, c) => Entry(i, c.toDouble) }.toVector,
                  0.0, rows.toDouble, m)
}

object LossyCounting {
  def apply[T](m: Int): LossyCounting[T] = new LossyCounting[T](m)
}
