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

  // NYC bounding box used by the synthetic taxi data and the workloads.
  val NycMinLon = -74.05
  val NycMaxLon = -73.70
  val NycMinLat = 40.55
  val NycMaxLat = 40.95

  private val NTaxiPerSf = 12_000_000L // paper: 12M yellow-cab rides

  /** Synthetic NYC taxi drop-offs (substitute for the TLC Jan–Mar 2015
    * dataset — see DESIGN.md). A Gaussian mixture reproduces the spatial
    * skew the paper's workloads rely on: a tilted dense Manhattan strip,
    * a Brooklyn cluster, two tight airport clusters (JFK, LGA) and a
    * uniform background. Value columns are the paper's three aggregation
    * columns: drop-off time (epoch seconds, Jan–Mar 2015), passenger
    * count, and trip distance. Deterministic in (sf, seed).
    */
  def taxiTrips(spark: SparkSession, sf: Double = 0.01, seed: Long = 42): DataFrame = {
    val u = rand(seed) // mixture selector
    def gauss(s: Long, mu: Double, sigma: Double) = randn(seed + s) * sigma + mu
    // Manhattan: a strip tilted NE (lon grows with lat along the axis).
    val t      = (rand(seed + 1) - 0.5) * 2 // position along the strip in [-1, 1]
    val manLon = lit(-73.99) + t * 0.020 + randn(seed + 2) * 0.006
    val manLat = lit(40.735) + t * 0.065 + randn(seed + 3) * 0.006
    val lonRaw = when(u < 0.45, manLon)
      .when(u < 0.70, gauss(4, -73.950, 0.030))  // Brooklyn
      .when(u < 0.78, gauss(5, -73.780, 0.006))  // JFK
      .when(u < 0.85, gauss(6, -73.870, 0.005))  // LGA
      .otherwise(rand(seed + 7) * (NycMaxLon - NycMinLon) + NycMinLon)
    val latRaw = when(u < 0.45, manLat)
      .when(u < 0.70, gauss(8, 40.650, 0.025))
      .when(u < 0.78, gauss(9, 40.645, 0.006))
      .when(u < 0.85, gauss(10, 40.770, 0.005))
      .otherwise(rand(seed + 11) * (NycMaxLat - NycMinLat) + NycMinLat)
    spark.range(n(NTaxiPerSf, sf)).select(
      least(lit(NycMaxLon), greatest(lit(NycMinLon), lonRaw))          as "lon",
      least(lit(NycMaxLat), greatest(lit(NycMinLat), latRaw))          as "lat",
      (lit(1420070400L) + (rand(seed + 12) * 7776000).cast(LongType))
        .cast(DoubleType)                                              as "dropoff_ts",
      (pow(rand(seed + 13), 2.0) * 6 + 1).cast(IntegerType)
        .cast(DoubleType)                                              as "passenger_count",
      round(pow(rand(seed + 14), 2.0) * 29 + lit(0.3), 2)              as "trip_distance",
    )
  }

  /** The three aggregation columns of the taxi schema. */
  val TaxiValueCols: Seq[String] = Seq("dropoff_ts", "passenger_count", "trip_distance")

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
}
