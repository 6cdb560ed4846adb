package repro.core

import java.nio.file.Files

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

import repro.SparkSpec
import repro.acid.AcidTable
import repro.metastore.{Catalog, TableDesc}

class AcidMvMaintainerSpec extends SparkSpec {
  private implicit lazy val sp: SparkSession = spark

  private def freshWorld(prefix: String): (Catalog, AcidTable, AcidTable, AcidMvMaintainer) = {
    val c = new Catalog
    val factSchema = StructType(Seq(
      StructField("f_date_sk", LongType), StructField("f_price", DoubleType)))
    val dimSchema = StructType(Seq(
      StructField("dd_date_sk", LongType), StructField("dd_year", IntegerType)))
    c.createTable(TableDesc(s"${prefix}_fact", factSchema,
      Files.createTempDirectory(s"${prefix}_fact").toString))
    c.createTable(TableDesc(s"${prefix}_dim", dimSchema,
      Files.createTempDirectory(s"${prefix}_dim").toString))
    val fact = new AcidTable(c, s"${prefix}_fact")
    val dim = new AcidTable(c, s"${prefix}_dim")
    import spark.implicits._
    val t0 = c.txns.openTxn()
    fact.insert(t0, (1L to 1000L).map(i => (i % 100 + 1, (i % 50) / 2.0)).toDF("f_date_sk", "f_price"))
    dim.insert(t0, (1L to 100L).map(i => (i, 2017 + (i % 2).toInt)).toDF("dd_date_sk", "dd_year"))
    c.txns.commit(t0)
    val m = new AcidMvMaintainer(spark, Map(s"${prefix}_fact" -> fact, s"${prefix}_dim" -> dim))
    (c, fact, dim, m)
  }

  private def mvSql(prefix: String) =
    s"""SELECT dd_year, SUM(f_price) AS sum_price, COUNT(*) AS cnt
       |FROM ${prefix}_fact, ${prefix}_dim
       |WHERE f_date_sk = dd_date_sk
       |GROUP BY dd_year""".stripMargin

  private def expected(prefix: String, m: AcidMvMaintainer): DataFrame = {
    m.refreshSourceViews()
    spark.sql(mvSql(prefix))
  }

  private def canon(df: DataFrame): Set[(Int, Long, Long)] =
    df.collect().map(r => (r.getInt(0), math.round(r.getDouble(1) * 100), r.getLong(2))).toSet

  test("create materializes the MV and records watermarks") {
    val (_, _, _, m) = freshWorld("w1")
    val st = m.create("mv_w1", mvSql("w1"))
    assert(st.watermarks.values.forall(_ == 1L))
    assert(canon(m.contents("mv_w1")) == canon(expected("w1", m)))
  }

  test("rebuild with no source changes is a no-op") {
    val (_, _, _, m) = freshWorld("w2")
    m.create("mv_w2", mvSql("w2"))
    assert(m.rebuild("mv_w2") == m.Unchanged)
  }

  test("insert-only fact change triggers incremental MERGE and stays correct") {
    val (c, fact, _, m) = freshWorld("w3")
    m.create("mv_w3", mvSql("w3"))
    import spark.implicits._
    val txn = c.txns.openTxn()
    fact.insert(txn, (1L to 500L).map(i => (i % 100 + 1, 1.5)).toDF("f_date_sk", "f_price"))
    c.txns.commit(txn)
    assert(m.rebuild("mv_w3") == m.IncrementalMerge)
    assert(canon(m.contents("mv_w3")) == canon(expected("w3", m)),
      "incremental merge diverged from full recompute")
  }

  test("second incremental rebuild advances the watermark correctly") {
    val (c, fact, _, m) = freshWorld("w4")
    m.create("mv_w4", mvSql("w4"))
    import spark.implicits._
    for (_ <- 1 to 3) {
      val txn = c.txns.openTxn()
      fact.insert(txn, (1L to 200L).map(i => (i % 100 + 1, 2.0)).toDF("f_date_sk", "f_price"))
      c.txns.commit(txn)
      assert(m.rebuild("mv_w4") == m.IncrementalMerge)
    }
    assert(canon(m.contents("mv_w4")) == canon(expected("w4", m)))
  }

  test("deletes force a full rebuild") {
    val (c, fact, _, m) = freshWorld("w5")
    m.create("mv_w5", mvSql("w5"))
    val txn = c.txns.openTxn()
    fact.delete(txn, col("f_price") > 20.0)
    c.txns.commit(txn)
    assert(m.rebuild("mv_w5") == m.FullRebuild)
    assert(canon(m.contents("mv_w5")) == canon(expected("w5", m)))
  }

  test("updates (delete+insert) force a full rebuild") {
    val (c, fact, _, m) = freshWorld("w6")
    m.create("mv_w6", mvSql("w6"))
    val txn = c.txns.openTxn()
    fact.update(txn, col("f_date_sk") === 5L, Map("f_price" -> lit(99.0)))
    c.txns.commit(txn)
    assert(m.rebuild("mv_w6") == m.FullRebuild)
    assert(canon(m.contents("mv_w6")) == canon(expected("w6", m)))
  }

  test("dimension change forces a full rebuild (multi-table delta unsupported)") {
    val (c, fact, dim, m) = freshWorld("w7")
    m.create("mv_w7", mvSql("w7"))
    import spark.implicits._
    val txn = c.txns.openTxn()
    fact.insert(txn, Seq((1L, 1.0)).toDF("f_date_sk", "f_price"))
    dim.insert(txn, Seq((999L, 2030)).toDF("dd_date_sk", "dd_year"))
    c.txns.commit(txn)
    assert(m.rebuild("mv_w7") == m.FullRebuild)
    assert(canon(m.contents("mv_w7")) == canon(expected("w7", m)))
  }

  test("SPJ materialized view uses incremental INSERT") {
    val (c, fact, _, m) = freshWorld("w8")
    val sql = s"SELECT f_date_sk, f_price FROM w8_fact WHERE f_price > 10.0"
    m.create("mv_w8", sql)
    import spark.implicits._
    val txn = c.txns.openTxn()
    fact.insert(txn, (1L to 100L).map(i => (i, 15.0)).toDF("f_date_sk", "f_price"))
    c.txns.commit(txn)
    assert(m.rebuild("mv_w8") == m.IncrementalInsert)
    m.refreshSourceViews()
    assert(m.contents("mv_w8").count() == spark.sql(sql).count())
  }
}
