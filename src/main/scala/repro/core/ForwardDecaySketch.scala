package repro.core

/** §5.3 extension: time-decayed aggregation via forward decay (Cormode et
  * al. 2009) layered on Unbiased Space Saving's weighted updates.
  *
  * A row for item i at time t contributes weight g(t) = exp(lambda·t)
  * measured *forward* from a fixed landmark (t = 0 here), so all updates are
  * positive and monotone — exactly the weighted-update generalization the
  * sketch already supports. Queries at time `now` divide by g(now), giving
  * each row the familiar backward weight exp(−lambda·(now − t)).
  *
  * Internally a running shift keeps raw weights near 1: whenever
  * lambda·t − shift grows past `RescaleAt`, all counts are multiplied by
  * exp(oldShift − newShift), which preserves bin order and unbiasedness
  * (scaling is a deterministic, expectation-preserving reduction).
  */
final class ForwardDecaySketch[T](val m: Int, val lambda: Double, seed: Long) extends Serializable {
  require(lambda >= 0, s"decay rate must be non-negative, got $lambda")

  private val inner = new UnbiasedSpaceSaving[T](m, seed)
  private var shift = 0.0
  private val RescaleAt = 60.0

  /** Ingest a row for `item` observed at time `t` (t must be ≥ 0; times need
    * not be monotone but typically are).
    */
  def update(item: T, t: Double): Unit = {
    require(t >= 0, s"timestamps must be non-negative, got $t")
    val raw = lambda * t
    if (raw - shift > RescaleAt) {
      inner.scaleAll(math.exp(shift - raw))
      shift = raw
    }
    inner.update(item, math.exp(raw - shift))
  }

  /** Estimated decayed count Σ_rows exp(−lambda·(now − t_row)) for `item`. */
  def decayedEstimate(item: T, now: Double): Double =
    inner.estimate(item) * math.exp(shift - lambda * now)

  /** Total decayed weight at `now`. */
  def decayedTotal(now: Double): Double =
    inner.totalWeight * math.exp(shift - lambda * now)

  /** Decayed top-k at query time `now`. */
  def topK(k: Int, now: Double): Vector[Entry[T]] = {
    val f = math.exp(shift - lambda * now)
    inner.summary.topK(k).map(e => Entry(e.item, e.count * f))
  }

  def contains(item: T): Boolean = inner.contains(item)
  def size: Int = inner.size
}
