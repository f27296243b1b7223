package repro.core

import java.util.{HashMap => JHashMap}
import scala.util.Random

/** Shared machinery for the two Space Saving variants (Algorithm 1).
  *
  * State is m bins, each an (item, count) pair, plus:
  *
  *  - a hash index item → bin for O(1) membership,
  *  - an indexed binary min-heap over bins keyed by (count, tieBreak) so the
  *    smallest bin is found in O(1) and updates cost O(log m).
  *
  * The tie-break key is re-randomized every time a bin's count changes, which
  * realizes the paper's assumption (§6.1) that when several bins share the
  * minimum count the one to increment is chosen at random.
  *
  * Counts are Doubles: the §5.3 generalization allows arbitrary positive
  * real-valued weights, and merge reductions (§5.5) produce Horvitz-Thompson
  * adjusted (non-integer) counts.
  *
  * Subclasses choose the label-replacement probability — the single line that
  * separates Deterministic from Unbiased Space Saving.
  */
abstract class SpaceSavingBase[T](val m: Int, val seed: Long) extends Serializable {
  require(m > 0, s"sketch must have at least one bin, got m=$m")

  protected val rng = repro.core.Rng(seed)

  protected var occupied = 0
  protected val counts: Array[Double] = new Array[Double](m)
  protected val labels: Array[Any]    = new Array[Any](m)
  private val tieBreak: Array[Long]   = new Array[Long](m)
  // heap(slot) = bin index; pos(bin) = heap slot
  private val heap: Array[Int] = new Array[Int](m)
  private val pos: Array[Int]  = new Array[Int](m)
  private val index = new JHashMap[T, Int]()
  private var totalW = 0.0

  /** Probability of overwriting the minimum bin's label when a weight-`w`
    * update for an unseen item lands on a bin currently holding `minCount`.
    */
  protected def replaceProb(minCount: Double, w: Double): Double

  /** Total weight processed (t for unit-weight streams). For stream-built
    * sketches this equals Σ counts exactly — every update adds its full
    * weight to exactly one bin.
    */
  def totalWeight: Double = totalW

  /** Number of occupied bins (≤ m). */
  def size: Int = occupied

  /** N̂_min: count of the smallest bin, or 0 while the sketch is not full
    * (conceptually the remaining bins hold count 0).
    */
  def minCount: Double = if (occupied < m) 0.0 else counts(heap(0))

  /** Point estimate for one item: its bin count if it labels a bin, else 0. */
  def estimate(item: T): Double = {
    val b = index.getOrDefault(item, -1)
    if (b >= 0) counts(b) else 0.0
  }

  /** Whether `item` currently labels a bin. */
  def contains(item: T): Boolean = index.containsKey(item)

  /** Process one row: item `item` with positive weight `w` (§5.3 allows any
    * positive real weight; unit-weight streams use w = 1).
    */
  def update(item: T, w: Double = 1.0): Unit = {
    require(w > 0, s"weights must be positive, got $w (use SignedMisraGries for deletions)")
    totalW += w
    val b = index.getOrDefault(item, -1)
    if (b >= 0) {
      counts(b) += w
      touch(b)
    } else if (occupied < m) {
      // Equivalent to incrementing one of the count-0 bins and taking its label.
      val nb = occupied
      occupied += 1
      counts(nb) = w
      labels(nb) = item
      index.put(item, nb)
      heap(nb) = nb
      pos(nb) = nb
      tieBreak(nb) = rng.nextLong()
      siftUp(nb)
    } else {
      val mb = heap(0)
      val nmin = counts(mb)
      counts(mb) = nmin + w
      if (rng.nextDouble() < replaceProb(nmin, w)) {
        index.remove(labels(mb).asInstanceOf[T])
        labels(mb) = item
        index.put(item, mb)
      }
      touch(mb)
    }
  }

  /** Process a batch of unit-weight rows. */
  def updateAll(items: IterableOnce[T]): Unit = items.iterator.foreach(update(_))

  /** Snapshot the sketch state for querying. */
  def summary: SketchSummary[T] = SketchSummary(entriesVector, minCount, totalW, m)

  /** Current bins as entries (unordered). */
  def entriesVector: Vector[Entry[T]] =
    (0 until occupied).iterator.map(b => Entry(labels(b).asInstanceOf[T], counts(b))).toVector

  // ---- heap internals -------------------------------------------------------

  private def less(a: Int, b: Int): Boolean =
    counts(a) < counts(b) || (counts(a) == counts(b) && tieBreak(a) < tieBreak(b))

  /** A bin's count changed: refresh its tie-break and restore heap order. */
  private def touch(bin: Int): Unit = {
    tieBreak(bin) = rng.nextLong()
    val slot = pos(bin)
    siftDown(slot)
    siftUp(pos(bin))
  }

  private def swap(i: Int, j: Int): Unit = {
    val bi = heap(i); val bj = heap(j)
    heap(i) = bj; heap(j) = bi
    pos(bj) = i; pos(bi) = j
  }

  private def siftUp(slot0: Int): Unit = {
    var s = slot0
    while (s > 0 && less(heap(s), heap((s - 1) / 2))) {
      swap(s, (s - 1) / 2)
      s = (s - 1) / 2
    }
  }

  private def siftDown(slot0: Int): Unit = {
    var s = slot0
    var done = false
    while (!done) {
      val l = 2 * s + 1
      val r = 2 * s + 2
      var sm = s
      if (l < occupied && less(heap(l), heap(sm))) sm = l
      if (r < occupied && less(heap(r), heap(sm))) sm = r
      if (sm == s) done = true
      else { swap(s, sm); s = sm }
    }
  }

  /** Multiply every count (and the running total) by a positive factor.
    * Order among bins is preserved, so the heap stays valid. Used by the
    * forward-decay extension (§5.3) to renormalize exponentially growing
    * weights.
    */
  protected[core] def scaleAll(f: Double): Unit = {
    require(f > 0, s"scale factor must be positive, got $f")
    var b = 0
    while (b < occupied) { counts(b) *= f; b += 1 }
    totalW *= f
  }

  /** Load pre-existing entries (merge outputs). Requires an empty sketch and
    * at most m entries with positive counts and distinct items; sets
    * totalWeight to `total` (for unbiased merges this is the sum of the input
    * sketches' totals).
    */
  protected[core] def load(entries: Seq[Entry[T]], total: Double): Unit = {
    require(occupied == 0, "load requires an empty sketch")
    require(entries.size <= m, s"cannot load ${entries.size} entries into $m bins")
    entries.foreach { e =>
      require(e.count > 0, s"entry counts must be positive, got $e")
      val nb = occupied
      occupied += 1
      counts(nb) = e.count
      labels(nb) = e.item
      require(!index.containsKey(e.item), s"duplicate item ${e.item} in load")
      index.put(e.item, nb)
      heap(nb) = nb
      pos(nb) = nb
      tieBreak(nb) = rng.nextLong()
      siftUp(nb)
    }
    totalW = total
  }
}
