package repro.model

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData

import scala.util.Random

class PlmSpec extends AnyFunSuite {

  private def firstOccurrence(a: Array[Long], s: Int, e: Int, v: Long): Int =
    SearchUtil.binaryLowerBound(a, v, s, e) - s

  test("predictions are lower bounds of first occurrence (paper §5.2 invariant)") {
    for (seed <- 1 to 5) {
      val a = TestData.sortedWithDuplicates(2000, seed)
      val plm = Plm.build(a, 0, a.length, delta = 20)
      for (v <- a.distinct) {
        val d = firstOccurrence(a, 0, a.length, v)
        assert(plm.predict(v) <= d, s"seed=$seed v=$v pred=${plm.predict(v)} D=$d")
      }
    }
  }

  test("average absolute error is bounded by delta over distinct values") {
    val a = TestData.sortedWithDuplicates(3000, 21)
    for (delta <- Seq(5.0, 50.0, 200.0)) {
      val plm = Plm.build(a, 0, a.length, delta)
      val distinct = a.distinct
      val errs = distinct.map(v => firstOccurrence(a, 0, a.length, v) - plm.predict(v))
      assert(errs.forall(_ >= 0))
      // the greedy bound holds per slice; globally the average stays near δ
      val avg = errs.sum.toDouble / errs.length
      assert(avg <= delta * 2, s"delta=$delta avgErr=$avg")
    }
  }

  test("smaller delta gives more segments (size-speed tradeoff, Fig 17b)") {
    val rng = new Random(22)
    val a = Array.fill(5000)((math.exp(rng.nextGaussian() * 2) * 1000).toLong)
    java.util.Arrays.sort(a)
    val fine = Plm.build(a, 0, a.length, delta = 2)
    val coarse = Plm.build(a, 0, a.length, delta = 500)
    assert(fine.numSegments > coarse.numSegments)
    assert(fine.sizeBytes > coarse.sizeBytes)
  }

  test("prediction + exponential search finds exact bounds") {
    val a = TestData.sortedWithDuplicates(4000, 23)
    val plm = Plm.build(a, 0, a.length, delta = 30)
    val rng = new Random(24)
    for (_ <- 0 until 500) {
      val v = a(rng.nextInt(a.length)) + rng.nextInt(3) - 1
      val got = SearchUtil.lowerBoundRange(a, v, plm.predict(v), 0, a.length)
      assert(got == SearchUtil.binaryLowerBound(a, v, 0, a.length))
    }
  }

  test("works on a sub-slice with offset indices") {
    val a = TestData.sortedWithDuplicates(1000, 25)
    val s = 200; val e = 700
    val plm = Plm.build(a, s, e, delta = 10)
    assert(plm.n == e - s)
    for (i <- s until e by 17) {
      val v = a(i)
      val d = firstOccurrence(a, s, e, v)
      assert(plm.predict(v) <= d)
      assert(plm.predict(v) >= 0 && plm.predict(v) < e - s)
    }
  }

  test("constant values produce one segment") {
    val a = Array.fill(500)(9L)
    val plm = Plm.build(a, 0, a.length, delta = 10)
    assert(plm.numSegments == 1)
    assert(plm.predict(9L) == 0)
  }

  test("strictly increasing values are modeled near-perfectly") {
    val a = Array.tabulate(1000)(i => i.toLong * 5)
    val plm = Plm.build(a, 0, a.length, delta = 10)
    val rng = new Random(26)
    for (_ <- 0 until 200) {
      val i = rng.nextInt(a.length)
      assert(math.abs(plm.predict(a(i)) - i) <= 60)
    }
  }

  test("empty slice") {
    val plm = Plm.build(Array(1L, 2L), 1, 1, delta = 10)
    assert(plm.n == 0)
    assert(plm.predict(5L) == 0)
  }

  test("values below the first slice clamp to zero") {
    val a = Array(100L, 200L, 300L)
    val plm = Plm.build(a, 0, a.length, delta = 10)
    assert(plm.predict(-50L) == 0)
  }

  test("predict is monotone non-decreasing") {
    val a = TestData.sortedWithDuplicates(2000, 27)
    val plm = Plm.build(a, 0, a.length, delta = 25)
    var prev = 0
    for (v <- a.head to math.min(a.last, a.head + 5000)) {
      val p = plm.predict(v)
      assert(p >= prev, s"at v=$v")
      prev = p
    }
  }
}
