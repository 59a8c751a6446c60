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
  private val NSupplierPerSf =    10_000L

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
      (rand(seed + 10) * n(NSupplierPerSf, sf) + 1).cast(LongType) as "l_suppkey",
    )
  }

  def supplier(spark: SparkSession, sf: Double = 0.01, seed: Long = 6): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NSupplierPerSf, sf) + 1).toDF("s_suppkey").select(
      $"s_suppkey",
      (rand(seed) * 25).cast(IntegerType)     as "s_nationkey",
      round(rand(seed + 1) * 11000 - 1000, 2) as "s_acctbal",
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

  /** Inline zipf-ish key expression: skewed toward 1 (heavy hitters).
    * Clamped in double space BEFORE the cast — with small alpha the inverse
    * power explodes past Long range and ANSI casts would throw.
    */
  private def zipfCol(nKeys: Long, alpha: Double, seed: Long) = {
    val norm = (1L to math.min(nKeys, 10000L)).map(k => 1.0 / math.pow(k, alpha)).sum
    least(lit(nKeys.toDouble), greatest(lit(1.0),
      pow(lit(1.0) / (rand(seed) * norm + 1e-9), lit(1.0 / alpha)))).cast(LongType)
  }

  // --- Chicago Crimes substitute (paper Sec. 9.1, ~6.7M rows at SF1) -----
  private val NCrimesPerSf = 6_700_000L
  private val NCrimeBlocks = 5_000L

  /** Synthetic crimes: 77 areas with zipf-ish skew, blocks nested in areas,
    * a crime type, and a year — supports C-Q1 (top-5 areas) and C-Q2
    * (HAVING count over blocks) with skew like the real dataset.
    */
  def crimes(spark: SparkSession, sf: Double = 0.01, seed: Long = 11): DataFrame = {
    import spark.implicits._
    spark.range(n(NCrimesPerSf, sf)).select(
      $"id".cast(LongType)                              as "cr_id",
      zipfCol(77, 0.2, seed).cast(LongType)             as "area",
      concat(lit("B"), lpad(zipfCol(NCrimeBlocks, 0.8, seed + 1).cast("string"), 5, "0"))
                                                        as "block",
      element_at(array(lit("THEFT"), lit("BATTERY"), lit("NARCOTICS"),
                       lit("ASSAULT"), lit("BURGLARY")),
                 (rand(seed + 2) * 5 + 1).cast("int"))  as "ctype",
      (rand(seed + 3) * 20 + 2001).cast(IntegerType)    as "cyear",
    )
  }

  // --- MovieLens substitute (27k movies / 20M ratings / 1M tags at SF1) --
  private val NMoviesPerSf  =    270_000L
  private val NRatingsPerSf = 20_000_000L
  private val NTagsPerSf    =  1_000_000L

  def movies(spark: SparkSession, sf: Double = 0.01, seed: Long = 21): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NMoviesPerSf, sf) + 1).toDF("movieid").select(
      $"movieid",
      (rand(seed) * 100 + 1920).cast(IntegerType) as "myear",
      element_at(array(lit("Drama"), lit("Comedy"), lit("Action"),
                       lit("Thriller"), lit("Documentary")),
                 (rand(seed + 1) * 5 + 1).cast("int")) as "genre",
    )
  }

  /** Ratings with zipf-skewed movie popularity (top movies ≫ tail). */
  def ratings(spark: SparkSession, sf: Double = 0.01, seed: Long = 22): DataFrame = {
    import spark.implicits._
    val nMovies = n(NMoviesPerSf, sf)
    spark.range(n(NRatingsPerSf, sf)).select(
      zipfCol(nMovies, 0.6, seed)                    as "r_movieid",
      (rand(seed + 1) * 200000 + 1).cast(LongType)   as "r_userid",
      (rand(seed + 2) * 9 + 1).cast(IntegerType)     as "r_stars",
    )
  }

  def tags(spark: SparkSession, sf: Double = 0.01, seed: Long = 23): DataFrame = {
    import spark.implicits._
    val nMovies = n(NMoviesPerSf, sf)
    spark.range(n(NTagsPerSf, sf)).select(
      zipfCol(nMovies, 0.6, seed + 7)                as "t_movieid",
      (rand(seed + 1) * 200000 + 1).cast(LongType)   as "t_userid",
      element_at(array(lit("classic"), lit("funny"), lit("dark"), lit("cult")),
                 (rand(seed + 2) * 4 + 1).cast("int")) as "tag",
    )
  }

  // --- Stack Overflow substitute (Sec. 9.1 archive, scaled 1:10) ---------
  private val NSofUsersPerSf    =  1_250_000L
  private val NSofPostsPerSf    =  4_850_000L
  private val NSofCommentsPerSf =  7_590_000L
  private val NSofBadgesPerSf   =  3_590_000L

  def sofUsers(spark: SparkSession, sf: Double = 0.01, seed: Long = 31): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NSofUsersPerSf, sf) + 1).toDF("u_id").select(
      $"u_id",
      (rand(seed) * 100000).cast(LongType)           as "u_rep",
      (rand(seed + 1) * 15 + 2008).cast(IntegerType) as "u_year",
    )
  }

  def sofPosts(spark: SparkSession, sf: Double = 0.01, seed: Long = 32): DataFrame = {
    import spark.implicits._
    val nUsers = n(NSofUsersPerSf, sf)
    spark.range(n(NSofPostsPerSf, sf)).select(
      $"id".cast(LongType)                         as "p_id",
      zipfCol(nUsers, 0.7, seed)                   as "p_owner",
      (rand(seed + 1) * 100 - 5).cast(IntegerType) as "p_score",
    )
  }

  def sofComments(spark: SparkSession, sf: Double = 0.01, seed: Long = 33): DataFrame = {
    import spark.implicits._
    val nUsers = n(NSofUsersPerSf, sf)
    spark.range(n(NSofCommentsPerSf, sf)).select(
      $"id".cast(LongType)                        as "cm_id",
      zipfCol(nUsers, 0.7, seed + 3)              as "cm_user",
      (rand(seed + 1) * 20).cast(IntegerType)     as "cm_score",
    )
  }

  def sofBadges(spark: SparkSession, sf: Double = 0.01, seed: Long = 34): DataFrame = {
    import spark.implicits._
    val nUsers = n(NSofUsersPerSf, sf)
    spark.range(n(NSofBadgesPerSf, sf)).select(
      $"id".cast(LongType)           as "b_id",
      zipfCol(nUsers, 0.7, seed + 5) as "b_user",
      element_at(array(lit("gold"), lit("silver"), lit("bronze")),
                 (rand(seed + 1) * 3 + 1).cast("int")) as "b_name",
    )
  }
}
