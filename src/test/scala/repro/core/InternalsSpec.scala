package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Internal-consistency checks for the bin store / min-heap. */
class HeapInvariantSpec extends AnyFunSuite {

  test("minCount always equals the smallest entry count once full") {
    val rng = new Random(1)
    val s = UnbiasedSpaceSaving[Int](17, seed = 1)
    (1 to 5000).foreach { k =>
      s.update(rng.nextInt(400), 1.0 + rng.nextInt(3))
      if (s.size == 17 && k % 97 == 0) {
        assert(s.minCount == s.entriesVector.map(_.count).min)
      }
    }
  }

  test("minCount is zero until the sketch fills") {
    val s = UnbiasedSpaceSaving[Int](10, seed = 2)
    (0 until 9).foreach { i => s.update(i); assert(s.minCount == 0.0) }
    s.update(9)
    assert(s.minCount > 0.0)
  }

  test("estimates stay in sync with entries under heavy churn") {
    val rng = new Random(3)
    val s = DeterministicSpaceSaving[Int](23, seed = 3)
    (1 to 20000).foreach(_ => s.update(rng.nextInt(5000)))
    val es = s.entriesVector
    es.foreach(e => assert(s.estimate(e.item) == e.count))
    assert(es.size == 23)
    // Anything not in entries estimates to zero.
    val labels = es.map(_.item).toSet
    (0 until 5000).filterNot(labels).take(50).foreach(i => assert(s.estimate(i) == 0.0))
  }

  test("weighted churn keeps the heap consistent") {
    val rng = new Random(4)
    val s = UnbiasedSpaceSaving[Int](11, seed = 4)
    (1 to 8000).foreach(_ => s.update(rng.nextInt(900), rng.nextDouble() * 5 + 0.01))
    assert(s.minCount == s.entriesVector.map(_.count).min)
    assert(math.abs(s.entriesVector.map(_.count).sum - s.totalWeight) < 1e-6)
  }
}

class RngSpec extends AnyFunSuite {

  test("scramble is deterministic and spreads sequential seeds") {
    assert(Rng.scramble(42L) == Rng.scramble(42L))
    val outs = (0L until 1000L).map(Rng.scramble)
    assert(outs.distinct.size == 1000)
  }

  test("first draws across sequential seeds look uniform") {
    val n = 20000
    val draws = (0 until n).map(i => Rng(i.toLong).nextDouble())
    val mean = draws.sum / n
    assert(math.abs(mean - 0.5) < 0.02, s"mean $mean")
    // No gross serial correlation between neighbouring seeds.
    val corrNum = (0 until n - 1).map(i => (draws(i) - mean) * (draws(i + 1) - mean)).sum
    val varSum = draws.map(d => (d - mean) * (d - mean)).sum
    assert(math.abs(corrNum / varSum) < 0.05)
  }
}

class TabSpec extends AnyFunSuite {

  test("renders aligned header, separator and rows") {
    val out = repro.exp.Tab.render("demo", Seq("a", "bb"), Seq(Seq(1, 2.5), Seq(10, 0.25)))
    val lines = out.split("\n")
    assert(lines.head == "== demo ==")
    assert(lines(1).trim.startsWith("a"))
    assert(lines(2).forall(c => c == '-' || c == ' '))
    assert(lines.length == 5)
    assert(lines.drop(1).map(_.length).distinct.size == 1, "all rows equally wide")
  }

  test("formats integral doubles without decimals and others with four") {
    assert(repro.exp.Tab.fmt(3.0) == "3")
    assert(repro.exp.Tab.fmt(0.25) == "0.2500")
    assert(repro.exp.Tab.fmt("x") == "x")
    assert(repro.exp.Tab.fmt(7) == "7")
  }
}

/** Frequent-item identification quality across the three sketch families. */
class FrequentItemsSpec extends AnyFunSuite {

  private def zipfStream(n: Int, seed: Long): Array[Int] = {
    val rng = new Random(seed)
    Array.fill(n) {
      // crude zipf-ish: item k with probability ∝ 1/(k+1)
      val u = rng.nextDouble()
      math.min(999, (math.exp(u * math.log(1000.0)) - 1).toInt)
    }
  }

  test("all three sketches recover the true top-5 of a skewed stream") {
    val stream = zipfStream(40000, seed = 5)
    val truth = stream.groupBy(identity).view.mapValues(_.length).toMap
    val top5 = truth.toSeq.sortBy(-_._2).take(5).map(_._1).toSet

    val uss = UnbiasedSpaceSaving[Int](60, seed = 5)
    val dss = DeterministicSpaceSaving[Int](60, seed = 5)
    val mg = MisraGries[Int](60)
    val lc = LossyCounting[Int](60)
    stream.foreach { x => uss.update(x); dss.update(x); mg.update(x); lc.update(x) }

    assert(uss.summary.topK(5).map(_.item).toSet == top5, "USS top-5")
    assert(dss.summary.topK(5).map(_.item).toSet == top5, "DSS top-5")
    assert(mg.summary.topK(5).map(_.item).toSet == top5, "MG top-5")
    assert(lc.summary.topK(5).map(_.item).toSet == top5, "LC top-5")
  }

  test("USS frequent-item counts are near-exact for the head of the distribution") {
    val stream = zipfStream(40000, seed = 6)
    val truth = stream.groupBy(identity).view.mapValues(_.length).toMap
    val uss = UnbiasedSpaceSaving[Int](100, seed = 6)
    stream.foreach(uss.update(_))
    truth.toSeq.sortBy(-_._2).take(5).foreach { case (item, n) =>
      val est = uss.estimate(item)
      assert(math.abs(est - n) / n < 0.1, s"item $item est=$est true=$n")
    }
  }

  test("frequentItems threshold agrees across USS and DSS on i.i.d. data") {
    val stream = zipfStream(40000, seed = 7)
    val uss = UnbiasedSpaceSaving[Int](80, seed = 7)
    val dss = DeterministicSpaceSaving[Int](80, seed = 7)
    stream.foreach { x => uss.update(x); dss.update(x) }
    val phi = 0.02
    val a = uss.summary.frequentItems(phi).map(_.item).toSet
    val b = dss.summary.frequentItems(phi).map(_.item).toSet
    assert((a & b).size >= (a.size * 8) / 10, s"USS=$a DSS=$b")
  }
}
