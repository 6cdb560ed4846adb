package repro.core

import java.nio.file.Files

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

import repro.{Oracle, SparkSpec}
import repro.acid.AcidTable
import repro.llap.{LlapIo, LlapTables}
import repro.metastore.{Catalog, TableDesc}

class SemijoinReductionSpec extends SparkSpec with StarFixture {
  private implicit lazy val sp: SparkSession = spark

  test("index semijoin (in-pushdown) preserves the join result") {
    starCatalog()
    val dimFiltered = item.filter(col("i_category") === "Sports")
    val (reduced, info) = SemijoinReduction.reducedJoin(
      storeSales, "ss_item_sk", dimFiltered, "i_item_sk")
    assert(info.strategy == "in-pushdown")
    val plain = storeSales.join(dimFiltered, col("ss_item_sk") === col("i_item_sk"))
    assertSameResult(
      reduced.groupBy("ss_customer_sk").agg(sum("ss_sales_price").as("s")),
      plain.groupBy("ss_customer_sk").agg(sum("ss_sales_price").as("s")))
  }

  test("index semijoin result against DuckDB (the paper's §4.6 query shape)") {
    starCatalog()
    val dimFiltered = item.filter(col("i_category") === "Sports")
    val (reduced, _) = SemijoinReduction.reducedJoin(
      storeSales, "ss_item_sk", dimFiltered, "i_item_sk")
    val q = reduced.groupBy("ss_customer_sk").agg(sum("ss_sales_price").as("sum_sales"))
    Oracle.assertEquivalent(
      q,
      """SELECT ss_customer_sk, SUM(ss_sales_price::DOUBLE) AS sum_sales
        |FROM store_sales, item
        |WHERE ss_item_sk = i_item_sk AND i_category = 'Sports'
        |GROUP BY ss_customer_sk""".stripMargin,
      "store_sales" -> storeSales, "item" -> item)
  }

  test("large key sets fall back to the range+Bloom reducer, still exact") {
    starCatalog()
    val dimFiltered = item.filter(col("i_item_sk") <= 90) // 90 keys
    val (reduced, info) = SemijoinReduction.reduceFact(
      storeSales, "ss_item_sk", dimFiltered, "i_item_sk", maxInPushdown = 10)
    assert(info.strategy == "range-bloom" && info.min == 1 && info.max == 90)
    val expected = storeSales.join(dimFiltered, col("ss_item_sk") === col("i_item_sk"))
      .select(storeSales.columns.map(col): _*)
    // Bloom may admit false positives beyond the true matches, never fewer
    assert(reduced.count() >= expected.count())
    // every true match survives
    assert(expected.join(reduced, storeSales.columns.toSeq, "left_anti").count() == 0)
  }

  test("reducer with an empty dimension side is rejected") {
    starCatalog()
    val none = item.filter(col("i_category") === "DoesNotExist")
    assertThrows[IllegalArgumentException](
      SemijoinReduction.reduceFact(storeSales, "ss_item_sk", none, "i_item_sk"))
  }

  test("dynamic partition pruning reads only matching partition directories") {
    val dir = Files.createTempDirectory("dpp").toFile
    val catalog = new Catalog
    val schema = StructType(Seq(
      StructField("k", LongType), StructField("v", DoubleType), StructField("p", LongType)))
    catalog.createTable(TableDesc("fact_p", schema, dir.toString, partitionCol = Some("p")))
    val fact = new AcidTable(catalog, "fact_p")
    import spark.implicits._
    val txn = catalog.txns.openTxn()
    fact.insert(txn, (1L to 1000L).map(i => (i, i * 1.0, i % 10)).toDF("k", "v", "p"))
    catalog.txns.commit(txn)
    assert(fact.partitionDirCount == 10)

    val dim = (0L to 9L).map(i => (i, if (i < 3) "keep" else "drop")).toDF("d_p", "tag")
    val (reduced, kept) = SemijoinReduction.prunePartitions(
      fact, dim.filter($"tag" === "keep"), "d_p")
    assert(kept == Set("0", "1", "2"))
    assert(reduced.select("p").distinct().collect().map(_.getLong(0)).toSet == Set(0L, 1L, 2L))
    assert(reduced.count() == 300)
  }

  test("semijoin over an LLAP table skips row groups via Bloom/min-max indexes") {
    val dir = Files.createTempDirectory("sj_llap").toFile
    // fact sorted by key so row groups have tight key ranges
    val fact = spark.range(0, 100000).select(
      (col("id") / 100).cast("long").as("f_key"),
      (col("id") % 97).cast("double").as("f_val"))
    LlapTables.writeTable(fact, dir, numFiles = 1, rowGroupSize = 4096)
    LlapIo.configure(128L << 20)
    LlapIo.elevator.metrics.reset()

    import spark.implicits._
    val dimFiltered = Seq(5L, 6L, 7L).toDF("d_key")
    val llapFact = LlapTables.read(spark, dir)
    val (reduced, info) = SemijoinReduction.reduceFact(llapFact, "f_key", dimFiltered, "d_key")
    assert(info.strategy == "in-pushdown")
    assert(reduced.count() == 300)
    val m = LlapIo.elevator.metrics
    assert(m.rowGroupsSkipped.get > m.rowGroupsRead.get,
      s"semijoin reducer should skip most row groups (read=${m.rowGroupsRead.get} skipped=${m.rowGroupsSkipped.get})")
  }
}
