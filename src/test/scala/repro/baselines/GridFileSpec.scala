package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.store.{ColumnStore, RangeQuery, Scan}

import scala.util.Random

class GridFileSpec extends AnyFunSuite {

  test("matches brute force on uniform data") {
    val rng = new Random(101)
    val store = ColumnStore.of(
      "a" -> Array.fill(2000)(rng.nextInt(100000).toLong),
      "b" -> Array.fill(2000)(rng.nextInt(100000).toLong),
      "c" -> Array.fill(2000)(rng.nextInt(100000).toLong))
    val gf = new GridFile(store, pageSize = 128)
    for (_ <- 0 until 40) {
      val q = TestData.randomQuery(store, rng)
      val (c, s) = Scan.brute(store, q, 0)
      val r = gf.query(q)
      assert(r.count == c && r.sum == s, s"$q")
    }
  }

  test("bucket count grows with data (splits happen)") {
    val rng = new Random(102)
    val store = ColumnStore.of(
      "a" -> Array.fill(3000)(rng.nextInt(1000000).toLong),
      "b" -> Array.fill(3000)(rng.nextInt(1000000).toLong))
    val gf = new GridFile(store, pageSize = 100)
    assert(gf.numBuckets > 10, s"only ${gf.numBuckets} buckets")
  }

  test("no bucket grossly exceeds the page size on uniform data") {
    val rng = new Random(103)
    val store = ColumnStore.of(
      "a" -> Array.fill(2000)(rng.nextInt(1000000).toLong),
      "b" -> Array.fill(2000)(rng.nextInt(1000000).toLong))
    val gf = new GridFile(store, pageSize = 100)
    // after a full build every query that hits one bucket scans at most ~page points
    val q = RangeQuery.of(2, 0 -> (500000L, 500001L), 1 -> (500000L, 500001L))
    val r = gf.query(q)
    assert(r.scanned <= 100 * 8, s"scanned ${r.scanned}")
  }

  test("aborts with GridFileAborted when the block cap is exceeded") {
    val rng = new Random(104)
    // pathologically skewed: power-law with huge outliers → midpoint splits
    // keep cutting empty space, boundaries pile up
    val skew = Array.fill(4000)(math.pow(10, rng.nextDouble() * 12).toLong)
    val store = ColumnStore.of(
      "a" -> skew,
      "b" -> skew.map(v => v / 3),
      "c" -> skew.map(v => v % 1000),
      "d" -> Array.fill(4000)(rng.nextInt(5).toLong),
      "e" -> skew.map(v => -v),
      "f" -> Array.fill(4000)(rng.nextInt(3).toLong))
    intercept[GridFileAborted] {
      new GridFile(store, pageSize = 32, aggDim = 0, blockCap = 5000)
    }
  }

  test("equality-heavy queries work") {
    val rng = new Random(105)
    val store = ColumnStore.of(
      "a" -> Array.fill(1500)(rng.nextInt(50).toLong),
      "b" -> Array.fill(1500)(rng.nextInt(50).toLong))
    val gf = new GridFile(store, pageSize = 64)
    for (v <- 0L until 20L) {
      val q = RangeQuery.of(2, 0 -> (v, v))
      assert(gf.query(q).count == Scan.brute(store, q)._1)
    }
  }

  test("buckets partition the data (counts add up on disjoint queries)") {
    val rng = new Random(106)
    val store = ColumnStore.of(
      "a" -> Array.fill(1000)(rng.nextInt(1000).toLong),
      "b" -> Array.fill(1000)(rng.nextInt(1000).toLong))
    val gf = new GridFile(store, pageSize = 64)
    val lo = gf.query(RangeQuery.of(2, 0 -> (Long.MinValue + 1, 499L))).count
    val hi = gf.query(RangeQuery.of(2, 0 -> (500L, Long.MaxValue))).count
    assert(lo + hi == 1000)
  }
}
