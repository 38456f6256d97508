package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic OLAP data at a configurable scale factor.
  *
  * SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
  * benchmarks use SF~=0.1. Generators are deterministic in (sf, seed) so
  * the DuckDB oracle sees identical input.
  */
object SynthData {
  private val NLineitemPerSf = 6_000_000L
  private val NOrdersPerSf   = 1_500_000L
  private val NCustomerPerSf =   150_000L
  private val NPartPerSf     =   200_000L

  private def n(base: Long, sf: Double): Long = math.max(1L, (base * sf).toLong)

  def lineitem(spark: SparkSession, sf: Double = 0.01, seed: Long = 0): DataFrame = {
    import spark.implicits._
    val nOrders = n(NOrdersPerSf, sf); val nPart = n(NPartPerSf, sf)
    spark.range(n(NLineitemPerSf, sf)).select(
      (rand(seed)     * nOrders + 1).cast(LongType)    as "l_orderkey",
      (rand(seed + 1) * nPart   + 1).cast(LongType)    as "l_partkey",
      (rand(seed + 2) * 7 + 1).cast(IntegerType)       as "l_linenumber",
      (rand(seed + 3) * 50 + 1).cast(DoubleType)       as "l_quantity",
      round(rand(seed + 4) * 90000 + 900, 2)           as "l_extendedprice",
      round(rand(seed + 5) * 0.10, 2)                  as "l_discount",
      round(rand(seed + 6) * 0.08, 2)                  as "l_tax",
      element_at(array(lit("N"), lit("R"), lit("A")),
                 (rand(seed + 7) * 3 + 1).cast("int")) as "l_returnflag",
      element_at(array(lit("O"), lit("F")),
                 (rand(seed + 8) * 2 + 1).cast("int")) as "l_linestatus",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 9) * 2557).cast("int"))    as "l_shipdate",
    )
  }

  def orders(spark: SparkSession, sf: Double = 0.01, seed: Long = 1): DataFrame = {
    import spark.implicits._
    val nCust = n(NCustomerPerSf, sf)
    spark.range(1, n(NOrdersPerSf, sf) + 1).toDF("o_orderkey").select(
      $"o_orderkey",
      (rand(seed)     * nCust + 1).cast(LongType)             as "o_custkey",
      element_at(array(lit("O"), lit("F"), lit("P")),
                 (rand(seed + 1) * 3 + 1).cast("int"))         as "o_orderstatus",
      round(rand(seed + 2) * 500000 + 1000, 2)                 as "o_totalprice",
      date_add(lit("1992-01-01").cast(DateType),
               (rand(seed + 3) * 2406).cast("int"))            as "o_orderdate",
    )
  }

  def customer(spark: SparkSession, sf: Double = 0.01, seed: Long = 2): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NCustomerPerSf, sf) + 1).toDF("c_custkey").select(
      $"c_custkey",
      (rand(seed) * 25).cast(IntegerType)                as "c_nationkey",
      round(rand(seed + 1) * 10000 - 1000, 2)            as "c_acctbal",
      element_at(array(lit("BUILDING"), lit("AUTOMOBILE"), lit("MACHINERY"),
                       lit("HOUSEHOLD"), lit("FURNITURE")),
                 (rand(seed + 2) * 5 + 1).cast("int"))   as "c_mktsegment",
    )
  }

  def part(spark: SparkSession, sf: Double = 0.01, seed: Long = 5): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NPartPerSf, sf) + 1).toDF("p_partkey").select(
      $"p_partkey",
      element_at(array(lit("STANDARD"), lit("SMALL"), lit("MEDIUM"),
                       lit("LARGE"), lit("ECONOMY"), lit("PROMO")),
                 (rand(seed) * 6 + 1).cast("int"))              as "p_type",
      (rand(seed + 1) * 50 + 1).cast(IntegerType)               as "p_size",
      round(lit(900.0) + ($"p_partkey" % 1000) / 10.0, 2)       as "p_retailprice",
    )
  }

  /** Skewed key column — for join-skew / cardinality-estimation papers. */
  def zipfKeys(spark: SparkSession, rows: Long, nKeys: Long,
               alpha: Double = 1.1, seed: Long = 3): DataFrame = {
    import spark.implicits._
    // Inverse-CDF draw over rank weights 1/k^alpha; good enough for skew.
    val norm = (1L to math.min(nKeys, 10000L)).map(k => 1.0 / math.pow(k, alpha)).sum
    spark.range(rows).select(
      least(lit(nKeys),
            greatest(lit(1L),
              pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha)).cast(LongType)
            )) as "k",
      rand(seed + 1) as "v",
    )
  }

  def uniformKeys(spark: SparkSession, rows: Long, nKeys: Long, seed: Long = 4): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * nKeys + 1).cast(LongType) as "k",
      rand(seed + 1)                          as "v",
    )
  }

  // -------------------------------------------------------------------------
  // Multi-dimensional evaluation datasets for the Flood reproduction
  // (synthetic analogs of the paper's sales / tpc-h / osm / perfmon — see
  // DESIGN.md "Substitutions"). All columns are 64-bit integers, as in the
  // paper's column store (floats scaled by a power of ten).
  // -------------------------------------------------------------------------

  /** Sales-like data (6 dims, fairly uniform — flattening should be ~neutral,
    * paper §7.4). Mimics an order-line table from a commercial sales DB.
    */
  def salesMulti(spark: SparkSession, rows: Long, seed: Long = 11): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed)     * 1000000).cast(LongType)        as "order_id",
      (rand(seed + 1) * 50000).cast(LongType)          as "customer_id",
      (rand(seed + 2) * 5000).cast(LongType)           as "product_id",
      (rand(seed + 3) * 100 + 1).cast(LongType)        as "quantity",
      (rand(seed + 4) * 99900 + 100).cast(LongType)    as "price_cents",
      (rand(seed + 5) * 1095).cast(LongType)           as "sale_day",
    )
  }

  /** TPC-H lineitem-like data (7 dims, fairly uniform, with a correlated
    * receiptdate = shipdate + small delta, as in real TPC-H).
    */
  def lineitemMulti(spark: SparkSession, rows: Long, seed: Long = 12): DataFrame = {
    import spark.implicits._
    val ship = (rand(seed + 5) * 2526).cast(LongType)
    spark.range(rows).select(
      (rand(seed)     * (rows / 4 + 1)).cast(LongType) as "orderkey",
      (rand(seed + 1) * 200000).cast(LongType)         as "partkey",
      (rand(seed + 2) * 10000).cast(LongType)          as "suppkey",
      (rand(seed + 3) * 50 + 1).cast(LongType)         as "quantity",
      (rand(seed + 4) * 11).cast(LongType)             as "discount",
      ship                                             as "shipdate",
      (ship + (rand(seed + 6) * 30 + 1).cast(LongType)) as "receiptdate",
    )
  }

  /** OSM-like data (6 dims, heavily skewed: clustered GPS coordinates from a
    * mixture of Gaussians, recent-heavy timestamps, zipfian categories) —
    * flattening should matter here (paper: 20–30×).
    */
  def osmMulti(spark: SparkSession, rows: Long, seed: Long = 13): DataFrame = {
    import spark.implicits._
    // city clusters in the US Northeast bounding box, scaled by 1e4
    val cluster = (rand(seed + 2) * 5).cast(IntegerType)
    val latCenter = element_at(
      array(lit(40.71), lit(42.36), lit(39.95), lit(41.82), lit(43.66)), cluster + 1)
    val lonCenter = element_at(
      array(lit(-74.01), lit(-71.06), lit(-75.17), lit(-71.41), lit(-70.26)), cluster + 1)
    spark.range(rows).select(
      $"id"                                            as "osm_id",
      // timestamp: exponentially recent-heavy over ~10 years of seconds
      (lit(315360000L) - (-log(rand(seed)) * 40000000).cast(LongType))
        .cast(LongType)                                as "ts",
      ((latCenter + randn(seed + 3) * 0.35) * 10000).cast(LongType) as "lat",
      ((lonCenter + randn(seed + 4) * 0.45) * 10000).cast(LongType) as "lon",
      (pow(rand(seed + 5), 3.0) * 4).cast(LongType)    as "rec_type",
      (pow(rand(seed + 6), 4.0) * 100).cast(LongType)  as "category",
    )
  }

  /** Perfmon-like data (6 dims, non-uniform and often highly skewed metrics
    * from machine monitoring logs).
    */
  def perfmonMulti(spark: SparkSession, rows: Long, seed: Long = 14): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * 31536000L).cast(LongType)                      as "log_ts",
      (pow(rand(seed + 1), 2.5) * 500).cast(LongType)              as "machine",
      (least(lit(10000.0), -log(rand(seed + 2)) * 1500)).cast(LongType) as "cpu",
      (exp(randn(seed + 3) * 1.0 + 7.0)).cast(LongType)            as "mem_mb",
      (when(rand(seed + 4) < 0.9, 0.0)
        .otherwise(-log(rand(seed + 5)) * 800)).cast(LongType)     as "swap_mb",
      (least(lit(6400.0), -log(rand(seed + 6)) * 400)).cast(LongType) as "loadavg",
    )
  }
}
