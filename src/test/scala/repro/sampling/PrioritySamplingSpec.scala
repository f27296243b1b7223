package repro.sampling

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil._
import scala.util.Random

class PrioritySamplingSpec extends AnyFunSuite {

  private val items: Seq[(Int, Double)] =
    (0 until 100).map(i => i -> (if (i < 5) 200.0 else 1.0 + i % 7))

  test("exhaustive when the population fits the sample size") {
    val s = PrioritySampling.sample(items.take(10), m = 20, seed = 1)
    assert(s.entries.size == 10)
    s.entries.foreach(e => assert(e.adjusted == e.weight))
    assert(s.threshold == 0.0)
    assert(s.subsetSum(_ => true).value == items.take(10).map(_._2).sum)
    assert(s.subsetSum(_ => true).variance == 0.0)
  }

  test("sample size is exactly m when the population is larger") {
    val s = PrioritySampling.sample(items, m = 30, seed = 2)
    assert(s.entries.size == 30)
  }

  test("adjusted weights never fall below the original weight") {
    val s = PrioritySampling.sample(items, m = 25, seed = 3)
    s.entries.foreach(e => assert(e.adjusted >= e.weight - 1e-12))
  }

  test("very heavy items are effectively always sampled with their exact weight") {
    (0 until 50).foreach { r =>
      val s = PrioritySampling.sample(items, m = 30, seed = 100 + r)
      (0 until 5).foreach { i =>
        assert(s.contains(i), s"heavy item $i missing at seed $r")
        assert(s.adjustedWeight(i) == 200.0, "certainty items keep exact weights")
      }
    }
  }

  test("subset sums are unbiased (Monte Carlo)") {
    val subset = (0 until 100 by 3).toSet
    val truth = items.collect { case (i, w) if subset(i) => w }.sum
    val reps = 4000
    val ests = (0 until reps).map { r =>
      PrioritySampling.sample(items, m = 20, seed = 1000 + r).subsetSumOf(subset).value
    }
    assertUnbiased(ests, truth, z = 4.5, label = "priority subset")
  }

  test("the total estimate is unbiased but not exact (Monte Carlo)") {
    val truth = items.map(_._2).sum
    val reps = 3000
    val totals = (0 until reps).map(r => PrioritySampling.sample(items, m = 20, seed = 5000 + r).estimatedTotal)
    assertUnbiased(totals, truth, z = 4.5, label = "priority total")
    assert(totals.distinct.size > 1, "total should vary across draws (unlike Space Saving)")
  }

  test("variance estimator is non-negative and zero for pure-certainty subsets") {
    val s = PrioritySampling.sample(items, m = 30, seed = 7)
    assert(s.subsetSumOf((0 until 5).toSet).variance == 0.0)
    assert(s.subsetSum(_ => true).variance >= 0.0)
  }

  test("normal intervals from the variance estimator have reasonable coverage") {
    val subset = (0 until 100 by 2).toSet
    val truth = items.collect { case (i, w) if subset(i) => w }.sum
    val reps = 800
    val cover = (0 until reps).count { r =>
      PrioritySampling.sample(items, m = 40, seed = 9000 + r).subsetSumOf(subset).covers(truth)
    }
    assert(cover.toDouble / reps >= 0.85, s"coverage ${cover.toDouble / reps}")
  }

  test("rejects non-positive weights and sizes") {
    assertThrows[IllegalArgumentException](PrioritySampling.sample(Seq(1 -> 0.0), 2, 1))
    assertThrows[IllegalArgumentException](PrioritySampling.sample(Seq(1 -> -1.0, 2 -> 1.0, 3 -> 1.0), 2, 1))
    assertThrows[IllegalArgumentException](PrioritySampling.sample(items, 0, 1))
  }

  test("deterministic per seed") {
    val a = PrioritySampling.sample(items, 15, seed = 42)
    val b = PrioritySampling.sample(items, 15, seed = 42)
    assert(a == b)
  }
}

class BottomKSpec extends AnyFunSuite {

  test("exhaustive below k distinct items: exact counts and tau = 1") {
    val bk = BottomK[Int](10, seed = 1)
    val rng = new Random(1)
    val stream = Array.fill(500)(rng.nextInt(8))
    stream.foreach(bk.update(_))
    val r = bk.result
    assert(r.tau == 1.0)
    val truth = stream.groupBy(identity).view.mapValues(_.size.toDouble).toMap
    truth.foreach { case (i, n) => assert(r.subsetSumOf(Set(i)).value == n) }
  }

  test("retains exactly k items when more are seen") {
    val bk = BottomK[Int](25, seed = 2)
    (0 until 500).foreach(bk.update(_))
    assert(bk.result.entries.size == 25)
  }

  test("retained counts are exact regardless of arrival order") {
    val counts = (0 until 200).map(i => i.toLong % 17 + 1)
    Seq(3L, 4L, 5L).foreach { seed =>
      val bk = BottomK[Int](30, seed = 11)
      shuffledStream(counts, seed).foreach(bk.update(_))
      val truth = counts.zipWithIndex.map { case (c, i) => i -> c.toDouble }.toMap
      bk.result.entries.foreach(e => assert(e.count == truth(e.item), s"item ${e.item}"))
    }
  }

  test("subset sums are unbiased across hash seeds (Monte Carlo)") {
    val counts = (0 until 300).map(i => (i % 13 + 1).toLong)
    val subset = (0 until 300 by 4).toSet
    val truth = subset.toSeq.map(counts(_).toDouble).sum
    val reps = 2000
    val ests = (0 until reps).map { r =>
      val bk = BottomK[Int](40, seed = 1000 + r)
      shuffledStream(counts, seed = 31).foreach(bk.update(_))
      bk.result.subsetSumOf(subset).value
    }
    assertUnbiased(ests, truth, z = 4.5, label = "bottom-k subset")
  }

  test("weighted updates accumulate exactly") {
    val bk = BottomK[String](5, seed = 6)
    bk.update("a", 2.5); bk.update("a", 1.5); bk.update("b", 3.0)
    val r = bk.result
    assert(r.subsetSumOf(Set("a")).value == 4.0)
    assert(bk.totalWeight == 7.0)
  }

  test("rejects non-positive weights and sizes") {
    assertThrows[IllegalArgumentException](BottomK[Int](0, 1))
    val bk = BottomK[Int](3, 1)
    assertThrows[IllegalArgumentException](bk.update(1, 0.0))
  }

  test("an item's membership is stable across arrival orders (hash-determined)") {
    val counts = (0 until 100).map(_ => 3L)
    val runs = Seq(1L, 2L, 3L).map { order =>
      val bk = BottomK[Int](20, seed = 77)
      shuffledStream(counts, order).foreach(bk.update(_))
      bk.result.entries.map(_.item).toSet
    }
    assert(runs.distinct.size == 1, "bottom-k membership must depend only on hashes")
  }
}
