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

  // ------------------------------------------------------------------
  // OpenMLDB-reproduction tables (stream workloads + TalkingData-lite).
  // ------------------------------------------------------------------

  /** TalkingData-lite click stream (Table 2 workload): the public Kaggle
    * dataset is 184.9M ad clicks with a heavily repeated `ip` key; we
    * reproduce the column shape and the zipf-from-fixed-universe key
    * regime (~278k unique ips at full scale) rather than downloading it.
    */
  def clicks(spark: SparkSession, rows: Long, nIps: Long = 278000L,
             alpha: Double = 1.05, seed: Long = 7): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      concat(lit("ip_"),
        least(lit(nIps), greatest(lit(1L),
          pow(lit(1.0) / (rand(seed) + 1e-12), lit(1.0 / alpha)).cast(LongType)
        ))) as "ip",
      (rand(seed + 1) * 500).cast(IntegerType)   as "app",
      (rand(seed + 2) * 3000).cast(IntegerType)  as "device",
      (rand(seed + 3) * 800).cast(IntegerType)   as "os",
      (rand(seed + 4) * 200).cast(IntegerType)   as "channel",
      (lit(1510000000000L) + (rand(seed + 5) * 4L * 86400000L).cast(LongType)) as "click_time",
      (rand(seed + 6) < 0.002)                   as "is_attributed",
    )
  }

  /** User action stream (MicroBench-style primary table): one row per
    * user event with price/quantity/category — the Figure 1 recommendation
    * workload shape.
    */
  def actions(spark: SparkSession, rows: Long, nUsers: Long, spanMs: Long = 86400000L,
              seed: Long = 11): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * nUsers + 1).cast(LongType)        as "userid",
      (rand(seed + 1) * spanMs).cast(LongType)        as "ts",
      element_at(array(lit("view"), lit("click"), lit("cart"), lit("buy")),
                 (rand(seed + 2) * 4 + 1).cast("int")) as "atype",
      round(rand(seed + 3) * 200 + 1, 2)              as "price",
      (rand(seed + 4) * 5 + 1).cast(IntegerType)      as "quantity",
      element_at(array(lit("shoes"), lit("books"), lit("toys"), lit("food"), lit("tech")),
                 (rand(seed + 5) * 5 + 1).cast("int")) as "category",
    )
  }

  /** Order stream (MicroBench secondary table for WINDOW UNION). */
  def ordersStream(spark: SparkSession, rows: Long, nUsers: Long, spanMs: Long = 86400000L,
                   seed: Long = 13): DataFrame = {
    import spark.implicits._
    spark.range(rows).select(
      (rand(seed) * nUsers + 1).cast(LongType)   as "userid",
      (rand(seed + 1) * spanMs).cast(LongType)   as "ts",
      lit("order")                               as "atype",
      round(rand(seed + 2) * 500 + 1, 2)         as "price",
      (rand(seed + 3) * 3 + 1).cast(IntegerType) as "quantity",
      element_at(array(lit("shoes"), lit("books"), lit("toys"), lit("food"), lit("tech")),
                 (rand(seed + 4) * 5 + 1).cast("int")) as "category",
    )
  }
}
