package repro.spark

import org.apache.spark.TaskContext
import org.apache.spark.sql.{Encoder, Encoders}
import org.apache.spark.sql.expressions.Aggregator
import repro.core.{Entry, Merge, SketchSummary, UnbiasedSpaceSaving}

/** One input row of the disaggregated stream: an item key and a positive
  * weight (1.0 for plain counting).
  */
final case class ItemWeight(item: String, weight: Double)

/** Serializable sketch bin for the aggregation output. */
final case class SketchEntryRow(item: String, count: Double)

/** Aggregation result: the m (or fewer) bins, N̂_min, and the total weight —
  * everything `SketchSummary` needs for subset sums (eq. 5) and top-k.
  */
final case class SketchResultRow(entries: Array[SketchEntryRow], minCount: Double, total: Double) {
  def toSummary(m: Int): SketchSummary[String] =
    SketchSummary(entries.iterator.map(e => Entry(e.item, e.count)).toVector, minCount, total, m)
}

/** Unbiased Space Saving as a Spark typed aggregate (the paper's §5.5
  * "Merging and Distributed counting" realized on Catalyst).
  *
  * Each partition builds a local sketch (`reduce` = Algorithm 1's update);
  * partial results are combined with the unbiased *pairwise PPS collapse*
  * merge, which preserves the total weight exactly and keeps every per-item
  * count unbiased (Theorem 2). The buffer travels via Java serialization.
  *
  * Randomness: each freshly created buffer scrambles the base seed with the
  * running task's partition id and a per-task counter so sketches built on
  * different partitions (and for different groups) are independent. Pass
  * `deterministic = true` to make single-partition runs reproducible.
  */
final class UnbiasedSpaceSavingAgg(m: Int, seed: Long, deterministic: Boolean = false)
    extends Aggregator[ItemWeight, UnbiasedSpaceSaving[String], SketchResultRow] {

  @transient private lazy val counter = new java.util.concurrent.atomic.AtomicInteger()

  private def scramble(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  override def zero: UnbiasedSpaceSaving[String] = {
    val s =
      if (deterministic) seed
      else {
        val pid = Option(TaskContext.get()).map(_.partitionId()).getOrElse(-1)
        scramble(seed ^ (pid.toLong << 32) ^ counter.getAndIncrement().toLong)
      }
    new UnbiasedSpaceSaving[String](m, s)
  }

  override def reduce(b: UnbiasedSpaceSaving[String], a: ItemWeight): UnbiasedSpaceSaving[String] = {
    b.update(a.item, a.weight)
    b
  }

  override def merge(b1: UnbiasedSpaceSaving[String], b2: UnbiasedSpaceSaving[String]): UnbiasedSpaceSaving[String] = {
    // Exactness fast path: if the union fits in m bins no reduction happens
    // and the merge is lossless either way.
    Merge.pairwiseUnbiased(m, scramble(b1.seed ^ b2.seed), Seq(b1.summary, b2.summary))
  }

  override def finish(b: UnbiasedSpaceSaving[String]): SketchResultRow = {
    val es = b.entriesVector.map(e => SketchEntryRow(e.item, e.count)).toArray
    SketchResultRow(es, b.minCount, b.totalWeight)
  }

  // Java serialization: the sketch graph (arrays + java.util.HashMap +
  // scala.util.Random) is fully Serializable, and unlike Kryo's field
  // reflection it needs no --add-opens into java.base on JDK 17+.
  override def bufferEncoder: Encoder[UnbiasedSpaceSaving[String]] =
    Encoders.javaSerialization[UnbiasedSpaceSaving[String]]

  override def outputEncoder: Encoder[SketchResultRow] = Encoders.product[SketchResultRow]
}
