package repro.core

import scala.collection.mutable

/** Baseline: the Misra-Gries frequent-item sketch (§5.2), in the batched
  * soft-threshold formulation of Agarwal et al.: keep at most m counters; when
  * an unseen item would create an (m+1)-th counter, subtract the minimum
  * counter value from all counters and drop the zeros. With unit weights this
  * is the classic decrement-all rule, batched.
  *
  * Deterministic guarantee: every reduction removes ≥ (m+1)·θ total mass while
  * any single item loses ≤ θ, so the undercount of any item is at most
  * n_tot/(m+1) ≤ n_tot/m.
  */
final class MisraGries[T](val m: Int) extends Serializable {
  require(m > 0, s"sketch must have at least one counter, got m=$m")

  private val counters = mutable.HashMap.empty[T, Double]
  private var totalW = 0.0
  private var decremented = 0.0

  /** Total weight processed. */
  def totalWeight: Double = totalW

  /** Total soft-threshold mass removed per surviving counter so far — adding
    * this back to a counter recovers the Deterministic Space Saving estimate
    * (the §5.2 isomorphism, in the other direction).
    */
  def totalDecrement: Double = decremented

  /** Number of live counters (≤ m). */
  def size: Int = counters.size

  /** Under-biased estimate: 0 ≤ n_i − N̂_i ≤ n_tot/m. */
  def estimate(item: T): Double = counters.getOrElse(item, 0.0)

  def contains(item: T): Boolean = counters.contains(item)

  def update(item: T, w: Double = 1.0): Unit = {
    require(w > 0, s"weights must be positive, got $w")
    totalW += w
    counters.updateWith(item) {
      case Some(c) => Some(c + w)
      case None    => Some(w)
    }
    if (counters.size > m) reduceToCapacity()
  }

  def updateAll(items: IterableOnce[T]): Unit = items.iterator.foreach(update(_))

  private def reduceToCapacity(): Unit = {
    // (m+1)-th largest value == minimum when there are exactly m+1 counters.
    val theta = counters.valuesIterator.min
    decremented += theta
    counters.filterInPlace((_, c) => c - theta > 0)
    counters.mapValuesInPlace((_, c) => c - theta)
  }

  def summary: SketchSummary[T] =
    SketchSummary(counters.iterator.map { case (i, c) => Entry(i, c) }.toVector, 0.0, totalW, m)

  /** The Agarwal et al. merge (§5.5): sum counts pairwise, then soft-threshold
    * by the (m+1)-th largest combined count. Deterministic, biased downward.
    */
  def mergeInPlace(other: MisraGries[T]): this.type = {
    other.counters.foreach { case (i, c) =>
      counters.updateWith(i) { case Some(x) => Some(x + c); case None => Some(c) }
    }
    totalW += other.totalW
    decremented += other.decremented
    if (counters.size > m) {
      val sorted = counters.valuesIterator.toArray.sortBy(-_)
      val theta = sorted(m) // (m+1)-th largest
      decremented += theta
      counters.filterInPlace((_, c) => c - theta > 0)
      counters.mapValuesInPlace((_, c) => c - theta)
    }
    this
  }
}

object MisraGries {
  def apply[T](m: Int): MisraGries[T] = new MisraGries[T](m)
}
