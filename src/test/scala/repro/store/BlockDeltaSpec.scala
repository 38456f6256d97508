package repro.store

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class BlockDeltaSpec extends AnyFunSuite {

  private def roundtrip(values: Array[Long]): Unit = {
    val c = BlockDeltaColumn.compress(values)
    assert(c.length == values.length)
    var i = 0
    while (i < values.length) {
      assert(c(i) == values(i), s"mismatch at $i: ${c(i)} != ${values(i)}")
      i += 1
    }
  }

  test("roundtrip: uniform random longs") {
    val rng = new Random(41)
    roundtrip(Array.fill(1000)(rng.nextLong() % 1000000))
  }

  test("roundtrip: sorted values (typical for a laid-out column)") {
    val rng = new Random(42)
    val a = Array.fill(5000)(rng.nextInt(100000).toLong)
    java.util.Arrays.sort(a)
    roundtrip(a)
  }

  test("roundtrip: constant column compresses to width zero") {
    val a = Array.fill(500)(123456789L)
    val c = BlockDeltaColumn.compress(a)
    roundtrip(a)
    assert(c.compressedBytes < a.length * 8 / 10)
  }

  test("roundtrip: negative values") {
    val rng = new Random(43)
    roundtrip(Array.fill(700)(-rng.nextInt(1000000).toLong))
  }

  test("roundtrip: non-multiple-of-128 lengths") {
    val rng = new Random(44)
    for (n <- Seq(1, 127, 128, 129, 255, 300))
      roundtrip(Array.fill(n)(rng.nextInt(10000).toLong))
  }

  test("roundtrip: wide deltas straddling word boundaries") {
    val rng = new Random(45)
    // deltas needing ~40 bits — guarantees packed values straddle 64-bit words
    roundtrip(Array.fill(600)(rng.nextLong() % (1L << 40)))
  }

  test("compresses locally-clustered data substantially (paper: 77% on their datasets)") {
    val rng = new Random(46)
    // block-local ranges ~1000 → ~10-bit deltas vs 64-bit raw
    val a = Array.tabulate(12800)(i => (i / 128).toLong * 1000000 + rng.nextInt(1000))
    val c = BlockDeltaColumn.compress(a)
    assert(c.compressionRatio > 0.6, s"ratio ${c.compressionRatio}")
    roundtrip(a)
  }

  test("toArray materializes the original") {
    val rng = new Random(47)
    val a = Array.fill(400)(rng.nextInt(100).toLong)
    assert(BlockDeltaColumn.compress(a).toArray.toSeq == a.toSeq)
  }

  test("constant-time access pattern: random probes agree") {
    val rng = new Random(48)
    val a = Array.fill(10000)(rng.nextLong() % (1L << 50))
    val c = BlockDeltaColumn.compress(a)
    for (_ <- 0 until 2000) {
      val i = rng.nextInt(a.length)
      assert(c(i) == a(i))
    }
  }
}
