package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}

class FloodSparkSpec extends SparkSpec {

  private lazy val df = SynthData.lineitemMulti(spark, 20000, seed = 5).cache()

  private lazy val layout = FloodSpark.learnLayout(
    df,
    gridDims = Seq("shipdate", "quantity", "discount"),
    cols = Seq(8, 4, 4),
    sortDim = "receiptdate")

  private lazy val laidOut = FloodSpark.applyLayout(df, layout).cache()

  test("layout preserves every row exactly once") {
    assert(laidOut.count() == df.count())
    val before = df.agg(sum(col("quantity"))).head.getLong(0)
    val after = laidOut.agg(sum(col("quantity"))).head.getLong(0)
    assert(before == after)
  }

  test("flood_cell is within [0, numCells)") {
    val mm = laidOut.agg(min(col("flood_cell")), max(col("flood_cell"))).head
    assert(mm.getLong(0) >= 0L)
    assert(mm.getLong(1) < layout.numCells)
  }

  test("rows are sorted by (flood_cell, sortDim) within each partition") {
    import spark.implicits._
    val ok = laidOut
      .select(col("flood_cell"), col("receiptdate"), spark_partition_id().as("pid"))
      .as[(Long, Long, Int)]
      .mapPartitions { it =>
        var sorted = true
        var prev: (Long, Long) = (Long.MinValue, Long.MinValue)
        for ((c, v, _) <- it) {
          if (c < prev._1 || (c == prev._1 && v < prev._2)) sorted = false
          prev = (c, v)
        }
        Iterator(sorted)
      }
      .collect()
    assert(ok.forall(identity))
  }

  test("scan COUNT/SUM matches DuckDB oracle: grid-dim range filter") {
    val preds = Seq(("shipdate", 200L, 900L), ("quantity", 5L, 20L))
    val got = FloodSpark
      .scan(laidOut, layout, preds)
      .agg(count(lit(1)).as("cnt"),
        coalesce(sum(col("discount")), lit(0L)).as("total_discount"))
    Oracle.assertEquivalent(
      got,
      """SELECT count(*) AS cnt,
        |       COALESCE(SUM(CAST(discount AS BIGINT)), 0) AS total_discount
        |FROM lineitem
        |WHERE CAST(shipdate AS BIGINT) BETWEEN 200 AND 900
        |  AND CAST(quantity AS BIGINT) BETWEEN 5 AND 20""".stripMargin,
      "lineitem" -> df)
  }

  test("scan matches DuckDB oracle: sort-dim filter included") {
    val preds = Seq(("shipdate", 0L, 1500L), ("receiptdate", 100L, 800L))
    val got = FloodSpark
      .scan(laidOut, layout, preds)
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      got,
      """SELECT count(*) AS cnt FROM lineitem
        |WHERE CAST(shipdate AS BIGINT) BETWEEN 0 AND 1500
        |  AND CAST(receiptdate AS BIGINT) BETWEEN 100 AND 800""".stripMargin,
      "lineitem" -> df)
  }

  test("scan matches DuckDB oracle: filter on a non-indexed dimension") {
    val preds = Seq(("suppkey", 0L, 500L))
    val got = FloodSpark.scan(laidOut, layout, preds).agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      got,
      "SELECT count(*) AS cnt FROM lineitem WHERE CAST(suppkey AS BIGINT) BETWEEN 0 AND 500",
      "lineitem" -> df)
  }

  test("scan matches DuckDB oracle: equality predicate") {
    val preds = Seq(("quantity", 7L, 7L))
    val got = FloodSpark.scan(laidOut, layout, preds)
      .agg(count(lit(1)).as("cnt"), coalesce(sum(col("partkey")), lit(0L)).as("pk_sum"))
    Oracle.assertEquivalent(
      got,
      """SELECT count(*) AS cnt, COALESCE(SUM(CAST(partkey AS BIGINT)), 0) AS pk_sum
        |FROM lineitem WHERE CAST(quantity AS BIGINT) = 7""".stripMargin,
      "lineitem" -> df)
  }

  test("grouped aggregation over the scan matches DuckDB") {
    val preds = Seq(("shipdate", 100L, 1200L), ("discount", 2L, 6L))
    val got = FloodSpark.scan(laidOut, layout, preds)
      .groupBy(col("discount").as("d"))
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      got,
      """SELECT CAST(discount AS BIGINT) AS d, count(*) AS cnt FROM lineitem
        |WHERE CAST(shipdate AS BIGINT) BETWEEN 100 AND 1200
        |  AND CAST(discount AS BIGINT) BETWEEN 2 AND 6
        |GROUP BY 1""".stripMargin,
      "lineitem" -> df)
  }

  test("cell pruning reduces the cells touched (projection works)") {
    val narrow = Seq(("shipdate", 100L, 200L))
    assert(FloodSpark.cellsTouched(layout, narrow) < layout.numCells)
    val all = FloodSpark.cellsTouched(layout, Seq.empty)
    assert(all == layout.numCells)
  }

  test("prunePredicate keeps exactly the rows whose cells intersect") {
    val preds = Seq(("shipdate", 300L, 700L))
    val pruned = laidOut.filter(FloodSpark.prunePredicate(layout, preds))
    val full = laidOut.filter(col("shipdate").between(300L, 700L))
    // pruning is a superset of the true result, never a subset
    assert(pruned.count() >= full.count())
    assert(pruned.filter(col("shipdate").between(300L, 700L)).count() == full.count())
  }

  test("cellStats summarizes each cell once") {
    val stats = FloodSpark.cellStats(laidOut, Seq("shipdate", "receiptdate")).cache()
    val nCells = laidOut.select(countDistinct(col("flood_cell"))).head.getLong(0)
    assert(stats.count() == nCells)
    assert(stats.agg(sum(col("cnt"))).head.getLong(0) == df.count())
    val bad = stats.filter(col("min_shipdate") > col("max_shipdate")).count()
    assert(bad == 0)
  }

  test("CdfSample frac is monotone and in [0,1]") {
    val s = FloodSpark.CdfSample(Array(1L, 5L, 5L, 9L, 20L))
    val vals = Seq(-3L, 1L, 4L, 5L, 10L, 20L, 50L)
    val fr = vals.map(s.frac)
    assert(fr.zip(fr.tail).forall { case (a, b) => a <= b })
    assert(fr.forall(f => f >= 0.0 && f <= 1.0))
  }

  test("layout strides follow mixed radix") {
    assert(layout.strides == Seq(16L, 4L, 1L))
    assert(layout.numCells == 128L)
  }
}
