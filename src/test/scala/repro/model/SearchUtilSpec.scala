package repro.model

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData

import scala.util.Random

class SearchUtilSpec extends AnyFunSuite {

  private def naiveLower(a: Array[Long], v: Long, s: Int, e: Int): Int = {
    var i = s
    while (i < e && a(i) < v) i += 1
    i
  }

  test("binaryLowerBound matches naive on duplicates") {
    val a = TestData.sortedWithDuplicates(500, 1)
    for (v <- Seq(a(0) - 1, a(0), a(250), a(499), a(499) + 1))
      assert(SearchUtil.binaryLowerBound(a, v, 0, a.length) == naiveLower(a, v, 0, a.length))
  }

  test("binaryUpperBound is exclusive bound of last <= v") {
    val a = Array(1L, 2, 2, 2, 5, 9)
    assert(SearchUtil.binaryUpperBound(a, 2, 0, a.length) == 4)
    assert(SearchUtil.binaryUpperBound(a, 4, 0, a.length) == 4)
    assert(SearchUtil.binaryUpperBound(a, 9, 0, a.length) == 6)
    assert(SearchUtil.binaryUpperBound(a, 0, 0, a.length) == 0)
  }

  test("binaryUpperBound handles Long.MaxValue without overflow") {
    val a = Array(1L, 5L, Long.MaxValue)
    assert(SearchUtil.binaryUpperBound(a, Long.MaxValue, 0, 3) == 3)
  }

  test("lowerBoundRange with exact guess") {
    val a = Array.tabulate(100)(i => i.toLong * 2)
    for (v <- 0 until 200)
      assert(SearchUtil.lowerBoundRange(a, v, v / 2, 0, a.length) ==
        naiveLower(a, v, 0, a.length), s"v=$v")
  }

  test("lowerBoundRange correct for every guess position") {
    val a = TestData.sortedWithDuplicates(200, 2)
    val rng = new Random(3)
    for (_ <- 0 until 500) {
      val v = a(rng.nextInt(a.length)) + rng.nextInt(3) - 1
      val guess = rng.nextInt(a.length)
      assert(SearchUtil.lowerBoundRange(a, v, guess, 0, a.length) ==
        naiveLower(a, v, 0, a.length), s"v=$v guess=$guess")
    }
  }

  test("lowerBoundRange restricted to sub-slice") {
    val a = TestData.sortedWithDuplicates(300, 4)
    val rng = new Random(5)
    for (_ <- 0 until 300) {
      val s = rng.nextInt(250)
      val e = s + 1 + rng.nextInt(a.length - s - 1)
      val v = a(rng.nextInt(a.length))
      val guess = s + rng.nextInt(e - s)
      assert(SearchUtil.lowerBoundRange(a, v, guess, s, e) == naiveLower(a, v, s, e))
    }
  }

  test("lowerBoundRange on empty slice returns start") {
    val a = Array(1L, 2L, 3L)
    assert(SearchUtil.lowerBoundRange(a, 2, 1, 2, 2) == 2)
  }

  test("upperBoundRange matches binary variant") {
    val a = TestData.sortedWithDuplicates(200, 6)
    val rng = new Random(7)
    for (_ <- 0 until 300) {
      val v = a(rng.nextInt(a.length))
      val guess = rng.nextInt(a.length)
      assert(SearchUtil.upperBoundRange(a, v, guess, 0, a.length) ==
        SearchUtil.binaryUpperBound(a, v, 0, a.length))
    }
  }

  test("gallop far from guess still correct") {
    val a = Array.tabulate(10000)(_.toLong)
    assert(SearchUtil.lowerBoundRange(a, 9999, 0, 0, a.length) == 9999)
    assert(SearchUtil.lowerBoundRange(a, 0, 9999, 0, a.length) == 0)
    assert(SearchUtil.lowerBoundRange(a, 10001, 0, 0, a.length) == 10000)
  }
}
