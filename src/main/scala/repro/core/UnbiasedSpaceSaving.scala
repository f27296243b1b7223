package repro.core

/** The paper's contribution (Algorithm 1, randomized variant): Space Saving
  * where an unseen item landing on the minimum bin takes over its label only
  * with probability `w / (N̂_min + w)` — `1/(N̂_min + 1)` for unit weights.
  *
  * Theorem 1: every per-item count estimate is unbiased. Theorem 2 extends
  * this to any reduction that preserves expected counts, which `Merge` uses.
  * The replacement rule is exactly a two-point PPS sample between the
  * incumbent label (mass N̂_min) and the new item (mass w).
  */
final class UnbiasedSpaceSaving[T](m: Int, seed: Long) extends SpaceSavingBase[T](m, seed) {
  override protected def replaceProb(minCount: Double, w: Double): Double =
    w / (minCount + w)
}

object UnbiasedSpaceSaving {
  def apply[T](m: Int, seed: Long): UnbiasedSpaceSaving[T] =
    new UnbiasedSpaceSaving[T](m, seed)

  /** Rebuild a sketch from merged entries (§5.5). `total` should be the sum
    * of the merged sketches' total weights so later updates keep the
    * martingale bookkeeping consistent.
    */
  def fromEntries[T](m: Int, seed: Long, entries: Seq[Entry[T]], total: Double): UnbiasedSpaceSaving[T] = {
    val s = new UnbiasedSpaceSaving[T](m, seed)
    s.load(entries, total)
    s
  }
}
