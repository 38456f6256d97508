package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData
import repro.store.{MultiDimIndex, RangeQuery, Scan}

import scala.util.Random

/** The key correctness property for every baseline: COUNT and SUM match the
  * brute-force answer on random data and random queries (this exercises
  * quantization edges, page pruning, BIGMIN skips, tree descent, and bucket
  * enumeration).
  */
class BaselinesSpec extends AnyFunSuite {

  private val store = TestData.randomStore(3000, 4, seed = 91)
  private val selOrder = Array(0, 3, 1, 2)

  private def indexes(aggDim: Int): Seq[MultiDimIndex] = Seq(
    new FullScan(store, aggDim),
    new ClusteredIndex(store, sortDim = 0, aggDim),
    new ZOrderIndex(store, selOrder, pageSize = 128, aggDim),
    new UBTree(store, selOrder, 128, aggDim),
    new HyperOctree(store, pageSize = 128, aggDim),
    new KdTree(store, selOrder, pageSize = 128, aggDim),
    new GridFile(store, pageSize = 256, aggDim),
    new RStarTree(store, selOrder, pageSize = 128, 8, aggDim)
  )

  private val all = indexes(aggDim = 1)

  test("all baselines match brute force on 60 random queries") {
    val rng = new Random(92)
    val queries = Array.fill(60)(TestData.randomQuery(store, rng))
    for (q <- queries) {
      val (c, s) = Scan.brute(store, q, aggDim = 1)
      for (idx <- all) {
        val r = idx.query(q)
        assert(r.count == c, s"${idx.name} count mismatch on $q: ${r.count} != $c")
        assert(r.sum == s, s"${idx.name} sum mismatch on $q")
      }
    }
  }

  test("all baselines agree on the unfiltered query") {
    val q = RangeQuery.full(4)
    for (idx <- all) {
      val r = idx.query(q)
      assert(r.count == store.numRows, idx.name)
    }
  }

  test("all baselines agree on empty-result queries") {
    val q = RangeQuery.of(4, 0 -> (store.max(0) + 1, store.max(0) + 100))
    for (idx <- all) assert(idx.query(q).count == 0, idx.name)
  }

  test("all baselines handle point lookups") {
    val rng = new Random(93)
    for (_ <- 0 until 10) {
      val row = rng.nextInt(store.numRows)
      val q = RangeQuery.of(4, 0 -> (store(0, row), store(0, row)), 1 -> (store(1, row), store(1, row)))
      val (c, _) = Scan.brute(store, q)
      for (idx <- all) assert(idx.query(q).count == c, idx.name)
    }
  }

  test("all baselines handle one-sided (open) ranges") {
    val rng = new Random(94)
    for (_ <- 0 until 15) {
      val q = RangeQuery.full(4)
      val dim = rng.nextInt(4)
      if (rng.nextBoolean()) q.lo(dim) = store(dim, rng.nextInt(store.numRows))
      else q.hi(dim) = store(dim, rng.nextInt(store.numRows))
      val (c, _) = Scan.brute(store, q)
      for (idx <- all) assert(idx.query(q).count == c, s"${idx.name} on $q")
    }
  }

  test("scanned >= count for every index (scan overhead >= 1)") {
    val rng = new Random(95)
    for (_ <- 0 until 20) {
      val q = TestData.randomQuery(store, rng)
      for (idx <- all) {
        val r = idx.query(q)
        assert(r.scanned >= r.count, idx.name)
      }
    }
  }

  test("selective indexes scan fewer points than full scan") {
    // a query selective in dim 0 (the leading/selectivity-ordered dim)
    val sorted = store.columns(0).clone(); java.util.Arrays.sort(sorted)
    val q = RangeQuery.of(4, 0 -> (sorted(100), sorted(160)))
    val fullScanned = new FullScan(store, 0).query(q).scanned
    for (idx <- all if idx.name != "Full Scan" && idx.name != "UB tree") {
      val r = idx.query(q)
      assert(r.scanned < fullScanned, s"${idx.name} scanned ${r.scanned}")
    }
  }

  test("build times are measured for non-trivial indexes") {
    for (idx <- all if idx.name != "Full Scan") assert(idx.buildNanos > 0, idx.name)
  }

  test("index sizes are reported") {
    for (idx <- all if idx.name != "Full Scan") assert(idx.sizeBytes > 0, idx.name)
  }

  test("clustered index: sorted by its dimension, full scan fallback works") {
    val ci = new ClusteredIndex(store, sortDim = 2, aggDim = 0)
    val col = ci.data.columns(2)
    assert(col.zip(col.tail).forall { case (a, b) => a <= b })
    // query not touching dim 2 → full scan path
    val q = RangeQuery.of(4, 0 -> (0L, 1000L))
    assert(ci.query(q).count == Scan.brute(store, q)._1)
    assert(ci.query(q).scanned == store.numRows)
  }

  test("k-d tree: page-size bound respected (within degeneracy limits)") {
    val kd = new KdTree(store, selOrder, pageSize = 64)
    assert(kd.numLeaves >= store.numRows / 64 / 4)
  }

  test("hyperoctree: smaller pages give more leaves") {
    val big = new HyperOctree(store, pageSize = 1024)
    val small = new HyperOctree(store, pageSize = 64)
    assert(small.numLeaves > big.numLeaves)
  }

  test("R* tree: leaves cover all rows") {
    val rt = new RStarTree(store, selOrder, pageSize = 100, 8)
    assert(rt.numLeaves == (store.numRows + 99) / 100)
  }

  test("baselines work in 2 dimensions") {
    val s2 = TestData.randomStore(1000, 2, seed = 96)
    val rng = new Random(97)
    val idxs = Seq(
      new ZOrderIndex(s2, Array(0, 1), 64),
      new UBTree(s2, Array(0, 1), 64),
      new HyperOctree(s2, 64),
      new KdTree(s2, Array(0, 1), 64),
      new GridFile(s2, 64),
      new RStarTree(s2, Array(0, 1), 64, 8))
    for (_ <- 0 until 25) {
      val q = TestData.randomQuery(s2, rng)
      val (c, _) = Scan.brute(s2, q)
      for (idx <- idxs) assert(idx.query(q).count == c, s"${idx.name} on $q")
    }
  }

  test("baselines work in 7 dimensions (tpch arity)") {
    val s7 = TestData.randomStore(1500, 7, seed = 98)
    val ord = Array.range(0, 7)
    val rng = new Random(99)
    val idxs = Seq(
      new ZOrderIndex(s7, ord, 128),
      new UBTree(s7, ord, 128),
      new HyperOctree(s7, 128),
      new KdTree(s7, ord, 128),
      new RStarTree(s7, ord, 128, 8))
    for (_ <- 0 until 25) {
      val q = TestData.randomQuery(s7, rng)
      val (c, _) = Scan.brute(s7, q)
      for (idx <- idxs) assert(idx.query(q).count == c, s"${idx.name} on $q")
    }
  }

  test("UB-tree agrees with the Z-order index and skips dead Z-stretches") {
    val rng = new Random(100)
    val z = new ZOrderIndex(store, selOrder, pageSize = 128)
    val ub = new UBTree(store, selOrder, 128)
    var ubScanned = 0L
    var fullScanned = 0L
    for (_ <- 0 until 20) {
      val q = TestData.randomQuery(store, rng)
      val rz = z.query(q)
      val ru = ub.query(q)
      assert(ru.count == rz.count)
      ubScanned += ru.scanned
      fullScanned += store.numRows
    }
    assert(ubScanned < fullScanned, "BIGMIN skipping should avoid full scans overall")
  }
}
