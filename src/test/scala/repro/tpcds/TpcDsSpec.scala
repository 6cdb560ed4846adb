package repro.tpcds

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

class TpcDsLiteSpec extends SparkSpec {

  private val sf = 0.01

  test("generator produces all six tables with sane sizes") {
    val t = TpcDsLite.all(spark, sf)
    assert(t.keySet == TpcDsLite.Tables.toSet)
    assert(t("store_sales").count() == 6000)
    assert(t("date_dim").count() == 1461)
    assert(t("store").count() == 10)
  }

  test("referential integrity: every fact key has a dimension row") {
    TpcDsLite.registerViews(spark, sf)
    def orphans(fk: String, fact: String, pk: String, dim: String): Long =
      spark.sql(s"SELECT COUNT(*) AS c FROM $fact LEFT ANTI JOIN $dim ON $fk = $pk")
        .collect()(0).getLong(0)
    assert(orphans("ss_sold_date_sk", "store_sales", "d_date_sk", "date_dim") == 0)
    assert(orphans("ss_item_sk", "store_sales", "i_item_sk", "item") == 0)
    assert(orphans("ss_customer_sk", "store_sales", "c_customer_sk", "customer") == 0)
    assert(orphans("ss_store_sk", "store_sales", "s_store_sk", "store") == 0)
  }

  test("store_returns keys exist in store_sales (q25-style joins hit)") {
    TpcDsLite.registerViews(spark, sf)
    val joined = spark.sql(
      """SELECT COUNT(*) AS c FROM store_returns JOIN store_sales
        |ON sr_item_sk = ss_item_sk AND sr_ticket_number = ss_ticket_number""".stripMargin)
    assert(joined.collect()(0).getLong(0) > 0)
  }

  test("generation is deterministic") {
    val a = TpcDsLite.storeSales(spark, sf).agg(sum("ss_sales_price")).collect()(0).getDouble(0)
    val b = TpcDsLite.storeSales(spark, sf).agg(sum("ss_sales_price")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("all 20 queries parse and run on Spark") {
    TpcDsLite.registerViews(spark, sf)
    TpcDsQueries.all.foreach { q =>
      val n = spark.sql(q.sql).collect().length
      assert(n >= 0, s"query ${q.id} failed")
    }
  }

  test("the v1.2-supported subset excludes the 4 modern-SQL queries") {
    assert(TpcDsQueries.all.size == 20)
    assert(TpcDsQueries.v12Supported.size == 16)
    assert(TpcDsQueries.all.count(_.sharedWorkQuery) == 1)
  }

  test("q03 matches DuckDB") {
    TpcDsLite.registerViews(spark, sf)
    Oracle.assertEquivalent(
      spark.sql(TpcDsQueries.byId("q03").sql),
      """SELECT d_year::INT AS d_year, i_brand, SUM(ss_sales_price::DOUBLE) AS sum_agg
        |FROM store_sales, date_dim, item
        |WHERE ss_sold_date_sk = d_date_sk AND ss_item_sk = i_item_sk
        |AND i_category = 'Electronics' AND d_moy::INT = 11
        |GROUP BY d_year::INT, i_brand ORDER BY d_year::INT, sum_agg DESC LIMIT 100""".stripMargin,
      "store_sales" -> TpcDsLite.storeSales(spark, sf),
      "date_dim" -> TpcDsLite.dateDim(spark),
      "item" -> TpcDsLite.item(spark, sf))
  }

  test("q96 (count) matches DuckDB") {
    TpcDsLite.registerViews(spark, sf)
    Oracle.assertEquivalent(
      spark.sql(TpcDsQueries.byId("q96").sql),
      """SELECT COUNT(*) AS cnt FROM store_sales, store, date_dim
        |WHERE ss_store_sk = s_store_sk AND ss_sold_date_sk = d_date_sk
        |AND s_state = 'TX' AND d_moy::INT = 6""".stripMargin,
      "store_sales" -> TpcDsLite.storeSales(spark, sf),
      "store" -> TpcDsLite.store(spark),
      "date_dim" -> TpcDsLite.dateDim(spark))
  }

  test("q88-like query benefits from shared work (plan merges 4 subqueries)") {
    TpcDsLite.registerViews(spark, sf)
    val df = spark.sql(TpcDsQueries.byId("q88").sql)
    val res = repro.core.SharedWork.optimize(spark, df)
    assert(res.sharedSubplans >= 1,
      "the q88 shape must expose shared subexpressions — the scan+join repeats")
    val got = res.df.collect()(0)
    val exp = df.collect()(0)
    assert(got == exp)
  }

  test("q92c correlated scalar subquery returns plausible values") {
    TpcDsLite.registerViews(spark, sf)
    val v = spark.sql(TpcDsQueries.byId("q92c").sql).collect()(0).getDouble(0)
    assert(v > 0, "excess-price sum should be positive")
  }
}
