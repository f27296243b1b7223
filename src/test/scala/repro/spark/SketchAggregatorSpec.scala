package repro.spark

import org.scalatest.funsuite.AnyFunSuite
import repro.core.UnbiasedSpaceSaving

/** Pure-JVM tests of the aggregator contract (no SparkSession needed). */
class SketchAggregatorSpec extends AnyFunSuite {

  private val agg = new UnbiasedSpaceSavingAgg(m = 8, seed = 1, deterministic = true)

  test("zero produces an empty sketch of the right capacity") {
    val b = agg.zero
    assert(b.m == 8 && b.size == 0 && b.totalWeight == 0.0)
  }

  test("reduce applies weighted updates") {
    val b = agg.zero
    agg.reduce(b, ItemWeight("a", 2.0))
    agg.reduce(b, ItemWeight("a", 1.0))
    agg.reduce(b, ItemWeight("b", 4.0))
    assert(b.estimate("a") == 3.0 && b.estimate("b") == 4.0)
    assert(b.totalWeight == 7.0)
  }

  test("merge is lossless when buffers fit and preserves totals otherwise") {
    val b1 = agg.zero; val b2 = agg.zero
    Seq("a" -> 3.0, "b" -> 2.0).foreach { case (i, w) => agg.reduce(b1, ItemWeight(i, w)) }
    Seq("b" -> 5.0, "c" -> 1.0).foreach { case (i, w) => agg.reduce(b2, ItemWeight(i, w)) }
    val m = agg.merge(b1, b2)
    assert(m.estimate("a") == 3.0 && m.estimate("b") == 7.0 && m.estimate("c") == 1.0)
    assert(m.totalWeight == 11.0)
  }

  test("merge reduces over-capacity unions to m bins with the exact total") {
    val big = new UnbiasedSpaceSavingAgg(m = 4, seed = 2, deterministic = true)
    val b1 = big.zero; val b2 = big.zero
    (0 until 4).foreach(i => big.reduce(b1, ItemWeight(s"x$i", i + 1.0)))
    (4 until 8).foreach(i => big.reduce(b2, ItemWeight(s"x$i", i + 1.0)))
    val m = big.merge(b1, b2)
    assert(m.size == 4)
    assert(math.abs(m.totalWeight - 36.0) < 1e-9)
    assert(math.abs(m.entriesVector.map(_.count).sum - 36.0) < 1e-9)
  }

  test("finish emits entries, minCount and total that round-trip to a summary") {
    val b = agg.zero
    Seq("a" -> 5.0, "b" -> 2.0).foreach { case (i, w) => agg.reduce(b, ItemWeight(i, w)) }
    val out = agg.finish(b)
    assert(out.total == 7.0)
    assert(out.minCount == 0.0) // not full
    val s = out.toSummary(8)
    assert(s.estimate("a") == 5.0 && s.estimate("b") == 2.0 && s.m == 8)
  }

  test("deterministic aggregators with the same seed build identical sketches") {
    def build(): UnbiasedSpaceSaving[String] = {
      val a = new UnbiasedSpaceSavingAgg(m = 3, seed = 7, deterministic = true)
      val b = a.zero
      (0 until 50).foreach(i => a.reduce(b, ItemWeight(s"k${i % 9}", 1.0)))
      b
    }
    assert(build().summary == build().summary)
  }

  test("buffer survives Java serialization round-trip") {
    val b = agg.zero
    (0 until 30).foreach(i => agg.reduce(b, ItemWeight(s"k${i % 12}", 1.0)))
    val bytes = {
      val bos = new java.io.ByteArrayOutputStream()
      val oos = new java.io.ObjectOutputStream(bos)
      oos.writeObject(b); oos.close()
      bos.toByteArray
    }
    val back = new java.io.ObjectInputStream(new java.io.ByteArrayInputStream(bytes))
      .readObject().asInstanceOf[UnbiasedSpaceSaving[String]]
    assert(back.summary == b.summary)
    // The revived buffer keeps working.
    back.update("k0")
    assert(back.totalWeight == b.totalWeight + 1.0)
  }
}
