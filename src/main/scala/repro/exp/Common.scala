package repro.exp

import repro.data.Streams

/** Shared utilities for the table-reproduction harnesses. */
object Exp {

  /** Relative root mean squared error √MSE / truth — the paper's headline
    * metric (§7: "RRMSE is defined as √MSE/n_S").
    */
  def rrmse(estimates: Seq[Double], truth: Double): Double = {
    require(truth != 0, "RRMSE undefined for zero truth")
    math.sqrt(estimates.iterator.map(e => (e - truth) * (e - truth)).sum / estimates.size) / math.abs(truth)
  }

  def mean(xs: Seq[Double]): Double = xs.sum / xs.size

  def stddev(xs: Seq[Double]): Double = {
    val m = mean(xs)
    math.sqrt(xs.iterator.map(x => (x - m) * (x - m)).sum / (xs.size - 1))
  }

  /** Discretized-Weibull counts rescaled so the stream total is close to
    * `targetTotal` — keeps totals comparable across skew (shape) settings.
    */
  def scaledWeibullCounts(nItems: Int, shape: Double, targetTotal: Long): Array[Long] = {
    val base = Streams.weibullCounts(nItems, shape, scale = 1.0)
    // Counts are ~linear in scale (up to rounding and the ≥1 clamp).
    val factor = targetTotal.toDouble / base.sum
    val scaled = Streams.weibullCounts(nItems, shape, scale = factor)
    scaled
  }

  /** True subset sum over item ids. */
  def subsetTruth(counts: Array[Long], subset: Set[Int]): Double =
    subset.iterator.map(counts(_).toDouble).sum

  /** Run `reps` independent replicates in parallel, collecting results. */
  def parReps[A](reps: Int)(body: Int => A): Vector[A] = {
    import java.util.concurrent.ConcurrentHashMap
    val out = new ConcurrentHashMap[Int, A]()
    java.util.stream.IntStream.range(0, reps).parallel().forEach(r => out.put(r, body(r)))
    (0 until reps).map(out.get).toVector
  }
}

/** Minimal fixed-width text-table renderer for bench/job output. */
object Tab {
  def fmt(x: Any): String = x match {
    case d: Double => if (d == d.floor && math.abs(d) < 1e15 && !d.isInfinite) f"$d%.0f" else f"$d%.4f"
    case other     => other.toString
  }

  def render(title: String, headers: Seq[String], rows: Seq[Seq[Any]]): String = {
    val cells = rows.map(_.map(fmt))
    val widths = headers.indices.map(i => (headers(i).length +: cells.map(_(i).length)).max)
    def line(vals: Seq[String]) =
      vals.zip(widths).map { case (v, w) => v.reverse.padTo(w, ' ').reverse }.mkString("  ")
    val sep = widths.map("-" * _).mkString("  ")
    (s"== $title ==" +: line(headers) +: sep +: cells.map(line)).mkString("\n")
  }
}
