package repro

import repro.store.{ColumnStore, RangeQuery}

import scala.util.Random

/** Deterministic generators for the non-Spark engine tests: random column
  * stores with a mix of uniform / skewed / low-cardinality dimensions, and
  * random conjunctive range queries over them.
  */
object TestData {

  /** A d-dimensional store with varied per-dimension distributions. */
  def randomStore(n: Int, d: Int, seed: Long): ColumnStore = {
    val rng = new Random(seed)
    val cols = Array.tabulate(d) { k =>
      k % 4 match {
        case 0 => Array.fill(n)(rng.nextInt(1000000).toLong) // uniform, high cardinality
        case 1 => Array.fill(n)((math.pow(rng.nextDouble(), 4) * 10000).toLong) // skewed
        case 2 => Array.fill(n)(rng.nextInt(8).toLong) // low cardinality
        case _ => Array.fill(n)((math.exp(rng.nextGaussian()) * 100).toLong) // lognormal
      }
    }
    new ColumnStore(Array.tabulate(d)(i => s"c$i"), cols)
  }

  /** A random query filtering 1..d dimensions, sometimes with equality and
    * sometimes with open-ended ranges.
    */
  def randomQuery(store: ColumnStore, rng: Random): RangeQuery = {
    val d = store.numDims
    val q = RangeQuery.full(d)
    val nf = 1 + rng.nextInt(d)
    val dims = rng.shuffle((0 until d).toList).take(nf)
    val anchorRow = rng.nextInt(store.numRows)
    for (dim <- dims) {
      val v = store(dim, anchorRow)
      rng.nextInt(4) match {
        case 0 => // equality
          q.lo(dim) = v; q.hi(dim) = v
        case 1 => // one-sided lower
          q.lo(dim) = v - rng.nextInt(1000)
        case 2 => // one-sided upper
          q.hi(dim) = v + rng.nextInt(1000)
        case _ => // two-sided around the anchor
          q.lo(dim) = v - rng.nextInt(5000)
          q.hi(dim) = v + rng.nextInt(5000)
      }
    }
    q
  }

  /** Sorted array with duplicates and gaps, for search/model tests. */
  def sortedWithDuplicates(n: Int, seed: Long): Array[Long] = {
    val rng = new Random(seed)
    val a = new Array[Long](n)
    var v = rng.nextInt(50).toLong
    var i = 0
    while (i < n) {
      a(i) = v
      if (rng.nextDouble() < 0.4) v += 1 + rng.nextInt(100)
      i += 1
    }
    a
  }
}
