package repro.ssb

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Synthetic Star-Schema Benchmark (SSB) at reduced scale (§7.3).
  *
  * One `lineorder` fact (600k rows/SF) and four dimensions (`date`,
  * `customer`, `supplier`, `part`), deterministic id-derived values.
  * Matches the SSB columns the 13-query workload touches.
  */
object SsbLite {

  private def n(base: Long, sf: Double): Long = math.max(100L, (base * sf).toLong)

  def lineorder(spark: SparkSession, sf: Double): DataFrame = {
    val custs = n(30000, sf); val parts = n(20000, sf); val supps = n(2000, sf)
    spark.range(0, n(600000, sf)).select(
      (col("id") / 4 + 1).as("lo_orderkey"),
      (col("id") % 4 + 1).cast("int").as("lo_linenumber"),
      ((col("id") * 13) % custs + 1).as("lo_custkey"),
      ((col("id") * 7) % parts + 1).as("lo_partkey"),
      ((col("id") * 11) % supps + 1).as("lo_suppkey"),
      (col("id") % 2556 + 1).as("lo_orderdate"),
      (col("id") % 50 + 1).cast("int").as("lo_quantity"),
      round((col("id") % 10000) / 10.0 + 100.0, 2).as("lo_extendedprice"),
      (col("id") % 11).cast("int").as("lo_discount"),
      round(((col("id") % 10000) / 10.0 + 100.0) * (lit(100) - col("id") % 11) / 100.0, 2)
        .as("lo_revenue"),
      round((col("id") % 6000) / 10.0 + 50.0, 2).as("lo_supplycost"),
    )
  }

  /** 7 years of days: 1992..1998, d_datekey 1..2556. */
  def date(spark: SparkSession): DataFrame =
    spark.range(1, 2557).select(
      col("id").as("d_datekey"),
      (lit(1992) + ((col("id") - 1) / 365).cast("int")).as("d_year"),
      ((lit(1992) + ((col("id") - 1) / 365).cast("int")) * 100 +
        ((((col("id") - 1) / 30) % 12) + 1).cast("int")).as("d_yearmonthnum"),
      ((((col("id") - 1) / 7) % 52) + 1).cast("int").as("d_weeknuminyear"),
    )

  def customer(spark: SparkSession, sf: Double): DataFrame =
    spark.range(1, n(30000, sf) + 1).select(
      col("id").as("c_custkey"),
      concat(lit("city_"), (col("id") % 250).cast("string")).as("c_city"),
      element_at(array(lit("UNITED STATES"), lit("CHINA"), lit("FRANCE"), lit("BRAZIL"), lit("INDIA")),
        (col("id") % 5 + 1).cast("int")).as("c_nation"),
      element_at(array(lit("AMERICA"), lit("ASIA"), lit("EUROPE"), lit("AFRICA")),
        (col("id") % 4 + 1).cast("int")).as("c_region"),
    )

  def supplier(spark: SparkSession, sf: Double): DataFrame =
    spark.range(1, n(2000, sf) + 1).select(
      col("id").as("s_suppkey"),
      concat(lit("city_"), (col("id") % 250).cast("string")).as("s_city"),
      element_at(array(lit("UNITED STATES"), lit("CHINA"), lit("FRANCE"), lit("BRAZIL"), lit("INDIA")),
        (col("id") % 5 + 1).cast("int")).as("s_nation"),
      element_at(array(lit("AMERICA"), lit("ASIA"), lit("EUROPE"), lit("AFRICA")),
        (col("id") % 4 + 1).cast("int")).as("s_region"),
    )

  def part(spark: SparkSession, sf: Double): DataFrame =
    spark.range(1, n(20000, sf) + 1).select(
      col("id").as("p_partkey"),
      concat(lit("MFGR#"), (col("id") % 5 + 1).cast("string")).as("p_mfgr"),
      concat(lit("MFGR#"), (col("id") % 25 + 1).cast("string")).as("p_category"),
      concat(lit("Brand#"), (col("id") % 1000 + 1).cast("string")).as("p_brand1"),
    )

  def all(spark: SparkSession, sf: Double): Map[String, DataFrame] = Map(
    "lineorder" -> lineorder(spark, sf),
    "date" -> date(spark),
    "customer" -> customer(spark, sf),
    "supplier" -> supplier(spark, sf),
    "part" -> part(spark, sf),
  )

  def registerViews(spark: SparkSession, sf: Double): Unit =
    all(spark, sf).foreach { case (name, df) => df.createOrReplaceTempView(name) }

  /** The denormalized materialized view of the federation experiment:
    * the full star join, flat. */
  val DenormalizedMvSql: String =
    """SELECT lo_orderdate, lo_quantity, lo_extendedprice, lo_discount, lo_revenue,
      |       lo_supplycost, d_year, d_yearmonthnum, d_weeknuminyear,
      |       c_city, c_nation, c_region, s_city, s_nation, s_region,
      |       p_mfgr, p_category, p_brand1
      |FROM lineorder, date, customer, supplier, part
      |WHERE lo_orderdate = d_datekey AND lo_custkey = c_custkey
      |  AND lo_suppkey = s_suppkey AND lo_partkey = p_partkey""".stripMargin
}
