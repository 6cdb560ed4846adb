package repro.core

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

class SharedWorkSpec extends SparkSpec with StarFixture {

  test("a self-unioned aggregate shares its common subexpression") {
    starCatalog()
    // q88-style: the same filtered aggregate computed twice
    val sub =
      """SELECT ss_item_sk, SUM(ss_sales_price) AS s FROM store_sales
        |WHERE ss_quantity > 3 GROUP BY ss_item_sk""".stripMargin
    val df = spark.sql(s"SELECT a.ss_item_sk, a.s + b.s AS s2 FROM ($sub) a JOIN ($sub) b ON a.ss_item_sk = b.ss_item_sk")
    val res = SharedWork.optimize(spark, df)
    assert(res.sharedSubplans == 1, s"expected 1 shared subplan, got ${res.sharedSubplans}")
    assertSameResult(res.df, df)
  }

  test("shared result is correct against DuckDB") {
    starCatalog()
    val sub = "SELECT ss_item_sk, COUNT(*) AS c FROM store_sales GROUP BY ss_item_sk"
    val df = spark.sql(
      s"SELECT a.ss_item_sk AS k, a.c + b.c AS c2 FROM ($sub) a JOIN ($sub) b ON a.ss_item_sk = b.ss_item_sk")
    val res = SharedWork.optimize(spark, df)
    Oracle.assertEquivalent(
      res.df,
      """WITH sub AS (SELECT ss_item_sk, COUNT(*) AS c FROM store_sales GROUP BY ss_item_sk)
        |SELECT a.ss_item_sk AS k, a.c + b.c AS c2 FROM sub a JOIN sub b ON a.ss_item_sk = b.ss_item_sk
        |""".stripMargin,
      "store_sales" -> storeSales)
  }

  test("no sharing when the plan has no repeated subexpressions") {
    starCatalog()
    val df = spark.sql(
      """SELECT d_year, COUNT(*) AS c FROM store_sales, date_dim
        |WHERE ss_sold_date_sk = d_date_sk GROUP BY d_year""".stripMargin)
    val res = SharedWork.optimize(spark, df)
    assert(res.sharedSubplans == 0)
  }

  test("nearly-equal subplans (different constants) are not merged") {
    starCatalog()
    val a = "SELECT ss_item_sk, SUM(ss_sales_price) AS s FROM store_sales WHERE ss_quantity > 3 GROUP BY ss_item_sk"
    val b = "SELECT ss_item_sk, SUM(ss_sales_price) AS s FROM store_sales WHERE ss_quantity > 7 GROUP BY ss_item_sk"
    val df = spark.sql(s"SELECT x.ss_item_sk, x.s + y.s AS t FROM ($a) x JOIN ($b) y ON x.ss_item_sk = y.ss_item_sk")
    val res = SharedWork.optimize(spark, df)
    // only the bare store_sales scan repeats, which is a smaller shared unit
    assert(res.sharedSubplans <= 1)
    assertSameResult(res.df, df)
  }

  test("three occurrences still produce one shared subplan") {
    starCatalog()
    val sub = "SELECT ss_item_sk AS k, COUNT(*) AS c FROM store_sales GROUP BY ss_item_sk"
    val df = spark.sql(
      s"""SELECT a.k, a.c + b.c + c.c AS t FROM ($sub) a
         |JOIN ($sub) b ON a.k = b.k JOIN ($sub) c ON a.k = c.k""".stripMargin)
    val res = SharedWork.optimize(spark, df)
    assert(res.sharedSubplans == 1)
    assertSameResult(res.df, df)
  }

  test("union-all of the same subquery is shared and correct") {
    starCatalog()
    val sub = "SELECT d_year, COUNT(*) AS c FROM date_dim GROUP BY d_year"
    val df = spark.sql(s"SELECT d_year, c FROM ($sub) UNION ALL SELECT d_year, c FROM ($sub)")
    val res = SharedWork.optimize(spark, df)
    assert(res.sharedSubplans == 1)
    assertSameResult(res.df, df)
  }
}
