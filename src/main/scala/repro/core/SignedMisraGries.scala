package repro.core

import scala.collection.mutable

/** §5.3 extension: signed / deletable counting via a two-sided soft-threshold
  * reduction — "making the thresholding operation two-sided so that negative
  * values are shrunk toward 0 as well". The paper explicitly provides no
  * theoretical analysis for this variant; it is included (and tested
  * behaviourally) as the paper's suggested mechanism for handling deletions
  * and arbitrary signed numeric aggregation.
  */
final class SignedMisraGries[T](val m: Int) extends Serializable {
  require(m > 0, s"sketch must have at least one counter, got m=$m")

  private val counters = mutable.HashMap.empty[T, Double]
  private var netW = 0.0

  /** Net signed weight processed. */
  def netWeight: Double = netW

  def size: Int = counters.size

  /** Shrunk-toward-zero estimate of the item's net weight. */
  def estimate(item: T): Double = counters.getOrElse(item, 0.0)

  def contains(item: T): Boolean = counters.contains(item)

  def update(item: T, w: Double): Unit = {
    require(w != 0, "zero-weight updates are no-ops; pass a signed non-zero weight")
    netW += w
    counters.updateWith(item) {
      case Some(c) if c + w == 0 => None
      case Some(c)               => Some(c + w)
      case None                  => Some(w)
    }
    if (counters.size > m) reduceToCapacity()
  }

  private def reduceToCapacity(): Unit = {
    // Two-sided soft threshold by the (m+1)-th largest |count|.
    val theta = counters.valuesIterator.map(math.abs).min
    counters.filterInPlace((_, c) => math.abs(c) - theta > 0)
    counters.mapValuesInPlace((_, c) => math.signum(c) * (math.abs(c) - theta))
  }

  def summary: SketchSummary[T] =
    SketchSummary(counters.iterator.map { case (i, c) => Entry(i, c) }.toVector, 0.0, netW, m)
}

object SignedMisraGries {
  def apply[T](m: Int): SignedMisraGries[T] = new SignedMisraGries[T](m)
}
