package repro.model

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData

import scala.util.Random

class RmiSpec extends AnyFunSuite {

  private val uniform = Array.tabulate(10000)(i => i.toLong * 3)
  private val dup = TestData.sortedWithDuplicates(5000, 11)
  private val skewed = {
    val rng = new Random(12)
    val a = Array.fill(5000)((math.pow(rng.nextDouble(), 5) * 1e9).toLong)
    java.util.Arrays.sort(a); a
  }

  test("predict is within bounds") {
    val rmi = Rmi.build(uniform)
    for (v <- Seq(-100L, 0L, 1500L, 29997L, 50000L)) {
      val p = rmi.predict(v)
      assert(p >= 0 && p < uniform.length)
    }
  }

  test("predict is monotone non-decreasing on uniform data") {
    val rmi = Rmi.build(uniform)
    var prev = -1
    for (v <- -10L to 30100L by 7) {
      val p = rmi.predict(v)
      assert(p >= prev, s"monotonicity broken at v=$v: $p < $prev")
      prev = p
    }
  }

  test("predict is monotone on skewed data") {
    val rmi = Rmi.build(skewed)
    var prev = -1
    var v = -5L
    while (v < skewed.last + 10) {
      val p = rmi.predict(v)
      assert(p >= prev, s"monotonicity broken at v=$v")
      prev = p
      v += math.max(1, skewed.last / 997)
    }
  }

  test("predict is monotone on duplicate-heavy data") {
    val rmi = Rmi.build(dup, leaves = 32)
    var prev = -1
    for (v <- dup.head - 2 to dup.last + 2) {
      val p = rmi.predict(v)
      assert(p >= prev)
      prev = p
    }
  }

  test("cdf is in [0,1] and monotone") {
    val rmi = Rmi.build(skewed)
    var prev = 0.0
    var v = skewed.head - 10
    while (v <= skewed.last + 10) {
      val c = rmi.cdf(v)
      assert(c >= 0.0 && c <= 1.0)
      assert(c >= prev - 1e-12)
      prev = c
      v += math.max(1, (skewed.last - skewed.head) / 1000)
    }
    assert(rmi.cdf(skewed.head - 1) == 0.0)
    assert(rmi.cdf(skewed.last) == 1.0)
  }

  test("lowerBound exact on uniform data") {
    val rmi = Rmi.build(uniform)
    val rng = new Random(13)
    for (_ <- 0 until 500) {
      val v = rng.nextLong(30010) - 5
      assert(rmi.lowerBound(v) == SearchUtil.binaryLowerBound(uniform, v, 0, uniform.length))
    }
  }

  test("upperBound exact on duplicates") {
    val rmi = Rmi.build(dup, leaves = 16)
    val rng = new Random(14)
    for (_ <- 0 until 500) {
      val v = dup(rng.nextInt(dup.length)) + rng.nextInt(3) - 1
      assert(rmi.upperBound(v) == SearchUtil.binaryUpperBound(dup, v, 0, dup.length))
    }
  }

  test("prediction error is small on uniform data") {
    val rmi = Rmi.build(uniform, leaves = 64)
    val rng = new Random(15)
    var errSum = 0L
    val trials = 1000
    for (_ <- 0 until trials) {
      val i = rng.nextInt(uniform.length)
      errSum += math.abs(rmi.predict(uniform(i)) - i)
    }
    assert(errSum.toDouble / trials < 50, s"avg error ${errSum.toDouble / trials}")
  }

  test("single-element and constant arrays") {
    val one = Rmi.build(Array(42L))
    assert(one.predict(42L) == 0)
    assert(one.cdf(41L) == 0.0 && one.cdf(42L) == 1.0)
    val const = Rmi.build(Array.fill(100)(7L))
    assert(const.lowerBound(7L) == 0)
    assert(const.upperBound(7L) == 100)
    assert(const.lowerBound(8L) == 100)
  }

  test("sizeBytes is positive and scales with leaves") {
    val small = Rmi.build(uniform, leaves = 8)
    val large = Rmi.build(uniform, leaves = 512)
    assert(small.sizeBytes > 0)
    assert(large.sizeBytes > small.sizeBytes)
  }
}
