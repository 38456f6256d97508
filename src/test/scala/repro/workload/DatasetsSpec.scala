package repro.workload

import repro.SparkSpec

class DatasetsSpec extends SparkSpec {

  private lazy val sales = Datasets.load(spark, "sales", 5000, seed = 1)
  private lazy val tpch = Datasets.load(spark, "tpch", 5000, seed = 1)
  private lazy val osm = Datasets.load(spark, "osm", 5000, seed = 1)
  private lazy val perfmon = Datasets.load(spark, "perfmon", 5000, seed = 1)

  test("all four datasets load with the declared arities (paper Table 1: 6/7/6/6)") {
    assert(sales.numDims == 6)
    assert(tpch.numDims == 7)
    assert(osm.numDims == 6)
    assert(perfmon.numDims == 6)
    for (ds <- Seq(sales, tpch, osm, perfmon)) assert(ds.numRows == 5000)
  }

  test("aggregation dimensions resolve") {
    assert(sales.aggDim == sales.store.dimIndex("price_cents"))
    assert(tpch.aggDim == tpch.store.dimIndex("quantity"))
  }

  test("generation is deterministic in the seed") {
    val a = Datasets.load(spark, "sales", 1000, seed = 7)
    val b = Datasets.load(spark, "sales", 1000, seed = 7)
    for (d <- 0 until a.numDims)
      assert(a.store.columns(d).sorted.toSeq == b.store.columns(d).sorted.toSeq)
  }

  private def skewRatio(col: Array[Long]): Double = {
    // ratio of the mass above the 90th percentile range to a uniform share:
    // mean/median distance is a cheap proxy — use (p99-p50)/(p50-p1)
    val s = col.clone(); java.util.Arrays.sort(s)
    val p1 = s((s.length * 0.01).toInt).toDouble
    val p50 = s(s.length / 2).toDouble
    val p99 = s((s.length * 0.99).toInt).toDouble
    if (p50 - p1 <= 0) Double.MaxValue else (p99 - p50) / (p50 - p1)
  }

  test("osm and perfmon carry heavy skew; sales is near-uniform (paper §7.4)") {
    // perfmon cpu (exponential): long upper tail
    assert(skewRatio(perfmon.store.columns(perfmon.store.dimIndex("cpu"))) > 3.0)
    // sales quantity (uniform): symmetric
    val r = skewRatio(sales.store.columns(sales.store.dimIndex("quantity")))
    assert(r > 0.5 && r < 2.0, s"sales quantity skew $r")
  }

  test("osm latitudes cluster around city centers") {
    val lat = osm.store.columns(osm.store.dimIndex("lat"))
    // all within the US northeast-ish band (scaled by 1e4), clusters ±~2 deg
    assert(lat.forall(v => v > 350000L && v < 480000L))
  }

  test("tpch receiptdate strictly follows shipdate") {
    val ship = tpch.store.columns(tpch.store.dimIndex("shipdate"))
    val rec = tpch.store.columns(tpch.store.dimIndex("receiptdate"))
    assert(ship.indices.forall(i => rec(i) > ship(i)))
  }

  test("perfmon swap is mostly zero (spike + tail)") {
    val swap = perfmon.store.columns(perfmon.store.dimIndex("swap_mb"))
    val zeros = swap.count(_ == 0L)
    assert(zeros > swap.length * 0.8, s"$zeros zeros")
    assert(swap.exists(_ > 0L))
  }

  test("unknown dataset name rejected") {
    intercept[IllegalArgumentException](Datasets.load(spark, "nope", 10))
  }

  test("bench row counts defined for every dataset") {
    assert(Datasets.Names.forall(Datasets.BenchRows.contains))
  }
}
