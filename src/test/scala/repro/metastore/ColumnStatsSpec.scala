package repro.metastore

import org.scalatest.funsuite.AnyFunSuite
import repro.util.HyperLogLog
import repro.SparkSpec

class ColumnStatsSpec extends AnyFunSuite {

  private def stats(n: Long, mn: Double, mx: Double, ndvKeys: Range) =
    ColumnStats(n, 0, Some(mn), Some(mx), None, None,
      HyperLogLog.of(ndvKeys.map(_.toLong)))

  test("merge adds counts and widens ranges") {
    val m = stats(10, 1, 5, 1 to 5).merge(stats(20, 3, 9, 3 to 9))
    assert(m.count == 30 && m.min.contains(1.0) && m.max.contains(9.0))
  }

  test("merge handles one-sided missing ranges") {
    val noRange = ColumnStats(5, 5, None, None, None, None, HyperLogLog())
    val m = stats(10, 1, 5, 1 to 5).merge(noRange)
    assert(m.min.contains(1.0) && m.max.contains(5.0) && m.nulls == 5)
  }

  test("merged NDV reflects the union without double counting") {
    val m = stats(10, 1, 100, 1 to 100).merge(stats(10, 50, 150, 50 to 150))
    val ndv = m.ndv
    assert(ndv > 130 && ndv < 170, s"ndv=$ndv, expected ~150")
  }

  test("string min/max merge lexicographically") {
    val a = ColumnStats(1, 0, None, None, Some("apple"), Some("mango"), HyperLogLog())
    val b = ColumnStats(1, 0, None, None, Some("banana"), Some("zebra"), HyperLogLog())
    val m = a.merge(b)
    assert(m.minStr.contains("apple") && m.maxStr.contains("zebra"))
  }

  test("equality selectivity is 1/ndv") {
    val s = stats(100, 1, 10, 1 to 10)
    assert(math.abs(s.equalitySelectivity - 0.1) < 0.02)
  }

  test("range selectivity by overlap fraction") {
    val s = stats(100, 0, 100, 1 to 100)
    assert(math.abs(s.rangeSelectivity(0, 50) - 0.5) < 1e-9)
    assert(s.rangeSelectivity(200, 300) == 0.0)
    assert(s.rangeSelectivity(-100, 200) == 1.0)
  }

  test("merge is commutative") {
    val a = stats(10, 1, 5, 1 to 5); val b = stats(20, 3, 9, 3 to 9)
    val ab = a.merge(b); val ba = b.merge(a)
    assert(ab.count == ba.count && ab.min == ba.min && ab.max == ba.max && ab.ndv == ba.ndv)
  }
}

/** StatsCollector against Spark data — verifies HMS-style stats collection. */
class StatsCollectorSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  private lazy val df = {
    import spark.implicits._
    spark.range(1, 1001).select(
      col("id").as("k"),
      (col("id") % 100).as("bucket"),
      when(col("id") % 10 === 0, lit(null)).otherwise(col("id") * 2.5).as("v"),
      concat(lit("s"), (col("id") % 50).cast("string")).as("s"),
    )
  }

  test("row count and per-column null counts") {
    val ts = StatsCollector.collect(df)
    assert(ts.rowCount == 1000)
    assert(ts.columns("k").nulls == 0)
    assert(ts.columns("v").nulls == 100)
  }

  test("numeric min/max") {
    val ts = StatsCollector.collect(df)
    assert(ts.columns("k").min.contains(1.0) && ts.columns("k").max.contains(1000.0))
    assert(ts.columns("bucket").min.contains(0.0) && ts.columns("bucket").max.contains(99.0))
  }

  test("string min/max") {
    val ts = StatsCollector.collect(df)
    assert(ts.columns("s").minStr.contains("s0"))
    assert(ts.columns("s").maxStr.contains("s9"))
  }

  test("NDV estimates within 10%") {
    val ts = StatsCollector.collect(df)
    def near(c: String, expect: Long): Unit = {
      val ndv = ts.columns(c).ndv
      assert(math.abs(ndv - expect).toDouble / expect < 0.1, s"$c ndv=$ndv expect=$expect")
    }
    near("k", 1000); near("bucket", 100); near("s", 50)
  }

  test("stats collected on two halves merge to the whole (additivity)") {
    val lo = df.filter(col("k") <= 500)
    val hi = df.filter(col("k") > 500)
    val merged = StatsCollector.collect(lo).merge(StatsCollector.collect(hi))
    val whole = StatsCollector.collect(df)
    assert(merged.rowCount == whole.rowCount)
    assert(merged.columns("k").min == whole.columns("k").min)
    assert(merged.columns("k").max == whole.columns("k").max)
    val mNdv = merged.columns("k").ndv; val wNdv = whole.columns("k").ndv
    assert(mNdv == wNdv, "HLL merge must be lossless: same registers either way")
  }
}
