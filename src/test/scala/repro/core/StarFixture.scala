package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._

import repro.SparkSpec

/** Deterministic mini star schema (TPC-DS flavoured) shared by the
  * optimizer suites: store_sales fact + date_dim/item dimensions,
  * registered as temp views and as MV rewriting sources.
  *
  * Data is arithmetic (not random) so containment tests have exactly
  * predictable slices.
  */
trait StarFixture { self: SparkSpec =>

  lazy val storeSales: DataFrame = spark.range(0, 20000).select(
    (col("id") % 100 + 1).as("ss_item_sk"),
    (col("id") % 730 + 1).as("ss_sold_date_sk"),
    (col("id") % 50 + 1).as("ss_customer_sk"),
    ((col("id") % 1000) / 10.0).as("ss_sales_price"),
    (col("id") % 10 + 1).as("ss_quantity"),
  )

  lazy val dateDim: DataFrame = spark.range(1, 731).select(
    col("id").as("d_date_sk"),
    (lit(2017) + ((col("id") - 1) / lit(365)).cast("int")).as("d_year"),
    ((((col("id") - 1) / 30) % 12) + 1).cast("int").as("d_moy"),
    (((col("id") - 1) % 30) + 1).cast("int").as("d_dom"),
  )

  lazy val item: DataFrame = spark.range(1, 101).select(
    col("id").as("i_item_sk"),
    element_at(
      array(lit("Sports"), lit("Books"), lit("Home"), lit("Music"), lit("Shoes")),
      (col("id") % 5 + 1).cast("int")).as("i_category"),
  )

  /** Registers the star schema temp views and returns a source-loaded
    * MvCatalog. Idempotent per suite. */
  def starCatalog(): MvCatalog = {
    storeSales.createOrReplaceTempView("store_sales")
    dateDim.createOrReplaceTempView("date_dim")
    item.createOrReplaceTempView("item")
    val cat = new MvCatalog(spark)
    Seq("store_sales", "date_dim", "item").foreach(cat.registerSource)
    cat
  }

  /** Order-insensitive result equality between two frames. */
  def assertSameResult(a: DataFrame, b: DataFrame): Unit = {
    def canon(df: DataFrame): Seq[Seq[String]] = {
      val cols = df.columns.sorted.toSeq
      df.select(cols.map(col): _*).collect().toSeq
        .map(_.toSeq.map {
          case null      => "null"
          case d: Double => f"$d%.6e"
          case x         => x.toString
        })
        .sortBy(_.mkString("|"))
    }
    assert(a.columns.sorted.toSeq == b.columns.sorted.toSeq,
      s"column sets differ: ${a.columns.toSeq} vs ${b.columns.toSeq}")
    val ca = canon(a); val cb = canon(b)
    assert(ca == cb,
      s"results differ (${ca.size} vs ${cb.size} rows)\n  a-only: ${ca.diff(cb).take(3)}\n  b-only: ${cb.diff(ca).take(3)}")
  }
}
