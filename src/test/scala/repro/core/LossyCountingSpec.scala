package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LossyCountingSpec extends AnyFunSuite {

  private def trueCounts(stream: Seq[Int]): Map[Int, Long] =
    stream.groupBy(identity).view.mapValues(_.size.toLong).toMap

  test("single window: exact counts, no decrements") {
    val lc = LossyCounting[Int](100)
    (0 until 50).foreach(i => lc.update(i % 10))
    assert(lc.completedWindows == 0)
    (0 until 10).foreach(i => assert(lc.estimate(i) == 5L))
  }

  test("estimates never exceed the true count") {
    val rng = new Random(1)
    val stream = Array.fill(5000)(rng.nextInt(80))
    val lc = LossyCounting[Int](50)
    stream.foreach(lc.update)
    val truth = trueCounts(stream.toSeq)
    (0 until 80).foreach(i => assert(lc.estimate(i) <= truth.getOrElse(i, 0L)))
  }

  test("undercount bounded by the number of completed windows ≈ t/m") {
    val rng = new Random(2)
    val stream = Array.fill(6000)(rng.nextInt(60))
    val m = 40
    val lc = LossyCounting[Int](m)
    stream.foreach(lc.update)
    assert(lc.completedWindows == stream.length / m)
    val truth = trueCounts(stream.toSeq)
    truth.foreach { case (i, n) =>
      assert(n - lc.estimate(i) <= lc.completedWindows, s"item $i undercount too large")
    }
  }

  test("upper bound sandwiches the true count") {
    val rng = new Random(3)
    val stream = Array.fill(4000)(rng.nextInt(120))
    val lc = LossyCounting[Int](30)
    stream.foreach(lc.update)
    val truth = trueCounts(stream.toSeq)
    truth.foreach { case (i, n) =>
      if (lc.contains(i)) {
        assert(lc.estimate(i) <= n)
        assert(lc.upperBound(i) >= n)
      }
    }
  }

  test("items with frequency above t/m survive") {
    val rng = new Random(4)
    val m = 25
    val lc = LossyCounting[Int](m)
    val stream = Array.fill(10000)(if (rng.nextDouble() < 0.2) 0 else 1 + rng.nextInt(600))
    stream.foreach(lc.update)
    assert(lc.contains(0), "frequent item evicted by lossy counting")
  }

  test("totalCount tracks rows processed") {
    val lc = LossyCounting[Int](10)
    (1 to 137).foreach(_ => lc.update(1))
    assert(lc.totalCount == 137L)
  }

  test("missing items report zero for both bounds") {
    val lc = LossyCounting[Int](10)
    (0 until 100).foreach(i => lc.update(i))
    assert(lc.estimate(-1) == 0L)
    assert(lc.upperBound(-1) == 0L)
  }
}
