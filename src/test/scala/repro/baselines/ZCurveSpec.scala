package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class ZCurveSpec extends AnyFunSuite {

  test("encode/decode roundtrip in 2..7 dims") {
    val rng = new Random(81)
    for (d <- 2 to 7) {
      val c = new ZCurve(d)
      for (_ <- 0 until 200) {
        val coords = Array.fill(d)(rng.nextLong(c.maxCoord + 1))
        val z = c.encode(coords)
        for (i <- 0 until d) assert(c.decode(z, i) == coords(i), s"d=$d dim=$i")
      }
    }
  }

  test("bits per dimension is floor(63/d) — sign-safe variant of the paper's 64/d") {
    assert(new ZCurve(6).bits == 10)
    assert(new ZCurve(7).bits == 9)
    assert(new ZCurve(2).bits == 31)
    // codes never set the sign bit
    assert(new ZCurve(2).totalBits <= 63)
  }

  test("dimension 0's LSB is the code's LSB") {
    val c = new ZCurve(3)
    assert(c.encode(Array(1L, 0L, 0L)) == 1L)
    assert(c.encode(Array(0L, 1L, 0L)) == 2L)
    assert(c.encode(Array(0L, 0L, 1L)) == 4L)
  }

  test("code ordering respects per-dim monotonicity at fixed other coords") {
    val c = new ZCurve(2)
    for (y <- 0L to 5L; x1 <- 0L to 5L; x2 <- x1 + 1 to 6L)
      assert(c.encode(Array(x1, y)) < c.encode(Array(x2, y)))
  }

  test("inBox agrees with coordinate comparison") {
    val rng = new Random(82)
    val c = new ZCurve(4)
    for (_ <- 0 until 300) {
      val lo = Array.fill(4)(rng.nextLong(100))
      val hi = lo.map(l => l + rng.nextLong(100))
      val pt = Array.fill(4)(rng.nextLong(250))
      val z = c.encode(pt)
      val expected = (0 until 4).forall(i => pt(i) >= lo(i) && pt(i) <= hi(i))
      assert(c.inBox(z, lo, hi) == expected)
    }
  }

  test("BIGMIN: exhaustive minimality check in 2D (8x8 grid)") {
    val c = new ZCurve(2)
    val rng = new Random(83)
    for (_ <- 0 until 100) {
      val lo = Array(rng.nextLong(8), rng.nextLong(8))
      val hi = Array(lo(0) + rng.nextLong(8 - lo(0)), lo(1) + rng.nextLong(8 - lo(1)))
      val zmin = c.encode(lo)
      val zmax = c.encode(hi)
      val boxCodes = (for (x <- lo(0) to hi(0); y <- lo(1) to hi(1))
        yield c.encode(Array(x, y))).sorted
      for (x <- 0L until 8L; y <- 0L until 8L) {
        val z = c.encode(Array(x, y))
        if (!c.inBox(z, lo, hi) && z >= zmin && z <= zmax) {
          val expect = boxCodes.find(_ > z)
          val got = c.bigmin(z, zmin, zmax)
          expect match {
            case Some(e) => assert(got == e, s"z=$z box=${lo.toSeq}..${hi.toSeq}: got $got want $e")
            case None    => assert(got == -1L || got > zmax)
          }
        }
      }
    }
  }

  test("BIGMIN: exhaustive check in 3D (4x4x4 grid)") {
    val c = new ZCurve(3)
    val rng = new Random(84)
    for (_ <- 0 until 40) {
      val lo = Array.fill(3)(rng.nextLong(4))
      val hi = lo.map(l => l + rng.nextLong(4 - l))
      val zmin = c.encode(lo)
      val zmax = c.encode(hi)
      val boxCodes = (for {
        x <- lo(0) to hi(0); y <- lo(1) to hi(1); w <- lo(2) to hi(2)
      } yield c.encode(Array(x, y, w))).sorted
      for (x <- 0L until 4L; y <- 0L until 4L; w <- 0L until 4L) {
        val z = c.encode(Array(x, y, w))
        if (!c.inBox(z, lo, hi) && z >= zmin && z <= zmax) {
          val got = c.bigmin(z, zmin, zmax)
          boxCodes.find(_ > z) match {
            case Some(e) => assert(got == e)
            case None    => assert(got == -1L || got > zmax)
          }
        }
      }
    }
  }

  test("BIGMIN result is always inside the box and greater than z") {
    val c = new ZCurve(5)
    val rng = new Random(85)
    for (_ <- 0 until 500) {
      val lo = Array.fill(5)(rng.nextLong(50))
      val hi = lo.map(l => l + rng.nextLong(60))
      val zmin = c.encode(lo)
      val zmax = c.encode(hi)
      val pt = Array.fill(5)(rng.nextLong(120))
      val z = c.encode(pt)
      if (!c.inBox(z, lo, hi) && z >= zmin && z < zmax) {
        val got = c.bigmin(z, zmin, zmax)
        if (got != -1L) {
          assert(got > z, s"bigmin $got not > z=$z")
          assert(c.inBox(got, lo, hi), s"bigmin $got not in box")
        }
      }
    }
  }

  test("Quantizer: monotone, clamped, full range") {
    val store = repro.TestData.randomStore(1000, 3, seed = 86)
    val q = Quantizer.fromStore(store, Array(0, 1, 2), levels = 256)
    for (d <- 0 until 3) {
      assert(q.quantize(d, store.min(d)) == 0)
      assert(q.quantize(d, store.max(d)) == 255)
      assert(q.quantize(d, store.min(d) - 100) == 0)
      assert(q.quantize(d, store.max(d) + 100) == 255)
      val mid = (store.min(d) + store.max(d)) / 2
      assert(q.quantize(d, mid) >= 0 && q.quantize(d, mid) <= 255)
      assert(q.quantize(d, store.min(d)) <= q.quantize(d, mid))
    }
  }
}
