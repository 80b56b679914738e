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
      element_at(array(lit("AIR"), lit("TRUCK"), lit("SHIP"), lit("RAIL"),
                       lit("MAIL"), lit("FOB"), lit("REG AIR")),
                 (rand(seed + 10) * 7 + 1).cast("int")) as "l_shipmode",
      element_at(array(lit("DELIVER IN PERSON"), lit("COLLECT COD"),
                       lit("NONE"), lit("TAKE BACK RETURN")),
                 (rand(seed + 11) * 4 + 1).cast("int")) as "l_shipinstruct",
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
      (rand(seed + 4) * 2).cast(IntegerType)                   as "o_shippriority",
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
      concat(lit("Brand#"),
             ((rand(seed + 2) * 5 + 1).cast("int") * 10 +
              (rand(seed + 3) * 5 + 1).cast("int")).cast("string")) as "p_brand",
      concat(element_at(array(lit("SM"), lit("MED"), lit("LG"), lit("JUMBO")),
                        (rand(seed + 4) * 4 + 1).cast("int")),
             lit(" "),
             element_at(array(lit("BOX"), lit("BAG"), lit("PKG"), lit("CASE")),
                        (rand(seed + 5) * 4 + 1).cast("int")))  as "p_container",
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

  /** Synthetic group-by table for the paper's §VI experiments: `nGroupCols`
    * integer group-id columns (`g0..`) + `nValCols` float value columns
    * (`v0..`). Group column i has `groupsPerCol(i)` distinct groups; group
    * sizes follow Zipf(theta) (theta=0 → uniform) via exact inverse-CDF
    * lookup, so the "59% of rows in the 4 largest groups at θ=1.3" property
    * from the paper holds.
    */
  def groupTable(spark: SparkSession, rows: Long, groupsPerCol: Seq[Int],
                 nValCols: Int, theta: Double, seed: Long = 7): DataFrame = {
    import org.apache.spark.sql.Column
    val gCols: Seq[Column] = groupsPerCol.zipWithIndex.map { case (g, i) =>
      val cdf = zipfCdf(g, theta)
      val look = udf((u: Double) => zipfLookup(cdf, u))
      look(rand(seed + i)) as s"g$i"
    }
    val vCols: Seq[Column] = (0 until nValCols).map(i =>
      round(rand(seed + 100 + i) * 1000, 4) as s"v$i")
    spark.range(rows).select(gCols ++ vCols: _*)
  }

  /** Zipf CDF over ranks 0..n-1 with exponent theta (theta=0 → uniform). */
  def zipfCdf(n: Int, theta: Double): Array[Double] = {
    val w = Array.tabulate(n)(k => 1.0 / math.pow(k + 1.0, theta))
    val total = w.sum
    val cdf = new Array[Double](n)
    var acc = 0.0
    var i = 0
    while (i < n) { acc += w(i) / total; cdf(i) = acc; i += 1 }
    cdf(n - 1) = 1.0
    cdf
  }

  def zipfLookup(cdf: Array[Double], u: Double): Int = {
    var lo = 0; var hi = cdf.length - 1
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (cdf(mid) < u) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** Random float table for the CSV-vs-Parquet experiments (§IX): columns
    * `c0..c{n-1}` of floats in [0,1) rounded to 4 decimals, as in the paper.
    */
  def floatTable(spark: SparkSession, rows: Long, nCols: Int, seed: Long = 9): DataFrame = {
    val cols = (0 until nCols).map(i => round(rand(seed + i), 4) as s"c$i")
    spark.range(rows).select(cols: _*)
  }
}
