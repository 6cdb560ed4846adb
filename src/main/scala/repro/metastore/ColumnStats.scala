package repro.metastore

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.util.HyperLogLog

/** Additive per-column statistics, as stored by HMS (§4.1).
  *
  * The paper requires statistics that "can be combined in an additive
  * fashion" so inserts and per-partition stats merge onto existing state:
  * count and range merge trivially; NDV merges losslessly through the
  * HyperLogLog sketch.
  *
  * Numeric columns carry a double-projected [min, max]; string columns a
  * lexicographic one. Both may be absent (all-null or non-orderable column).
  */
final case class ColumnStats(
    count: Long,
    nulls: Long,
    min: Option[Double],
    max: Option[Double],
    minStr: Option[String],
    maxStr: Option[String],
    ndvSketch: HyperLogLog) {

  /** Estimated number of distinct values. */
  def ndv: Long = ndvSketch.estimate

  /** Additive merge — used when new partitions or inserts add onto a table. */
  def merge(other: ColumnStats): ColumnStats = ColumnStats(
    count = count + other.count,
    nulls = nulls + other.nulls,
    min = (min.toSeq ++ other.min.toSeq).reduceOption((a, b) => math.min(a, b)),
    max = (max.toSeq ++ other.max.toSeq).reduceOption((a, b) => math.max(a, b)),
    minStr = (minStr.toSeq ++ other.minStr.toSeq).reduceOption((a, b) => if (a <= b) a else b),
    maxStr = (maxStr.toSeq ++ other.maxStr.toSeq).reduceOption((a, b) => if (a >= b) a else b),
    ndvSketch = ndvSketch.merge(other.ndvSketch),
  )

  /** Selectivity of `col = literal` under uniformity: 1/NDV. */
  def equalitySelectivity: Double = if (ndv <= 0) 1.0 else 1.0 / ndv

  /** Selectivity of `lo <= col <= hi` by range overlap (numeric only). */
  def rangeSelectivity(lo: Double, hi: Double): Double = (min, max) match {
    case (Some(mn), Some(mx)) if mx > mn =>
      val overlap = math.max(0.0, math.min(hi, mx) - math.max(lo, mn))
      math.min(1.0, overlap / (mx - mn))
    case _ => 1.0
  }
}

/** Table-level statistics: cardinality plus per-column stats, all additive. */
final case class TableStats(rowCount: Long, columns: Map[String, ColumnStats]) {
  def merge(other: TableStats): TableStats = TableStats(
    rowCount + other.rowCount,
    (columns.keySet ++ other.columns.keySet).map { c =>
      c -> ((columns.get(c), other.columns.get(c)) match {
        case (Some(a), Some(b)) => a.merge(b)
        case (Some(a), None)    => a
        case (None, Some(b))    => b
        case (None, None)       => throw new IllegalStateException(s"no stats for $c")
      })
    }.toMap,
  )
}

object StatsCollector {

  /** Computes [[TableStats]] for a DataFrame in a single pass per batch.
    *
    * Uses one aggregate job collecting count/min/max/null-count per column
    * plus an exact-enough NDV via per-partition HLL sketches merged on the
    * driver (mirrors HMS computing stats at write time and merging).
    */
  def collect(df: DataFrame): TableStats = {
    val fields = df.schema.fields.toSeq
    val aggs = fields.flatMap { f =>
      val c = col(f.name)
      val isNum = f.dataType.isInstanceOf[NumericType] || f.dataType == DateType
      Seq(
        sum(when(c.isNull, 1L).otherwise(0L)).as(s"${f.name}__nulls"),
        (if (isNum) min(c.cast(DoubleType)) else lit(null).cast(DoubleType)).as(s"${f.name}__min"),
        (if (isNum) max(c.cast(DoubleType)) else lit(null).cast(DoubleType)).as(s"${f.name}__max"),
        (if (f.dataType == StringType) min(c) else lit(null).cast(StringType)).as(s"${f.name}__mins"),
        (if (f.dataType == StringType) max(c) else lit(null).cast(StringType)).as(s"${f.name}__maxs"),
      )
    }
    val row = df.agg(count(lit(1)).as("__rows"), aggs: _*).collect()(0)
    val rows = row.getAs[Long]("__rows")

    // NDV sketches: map each column value to a long and fold into HLLs per partition.
    val names = fields.map(_.name)
    val sketches = df
      .select(names.map(n => xxhash64(col(n)).as(n)): _*)
      .rdd
      .mapPartitions { it =>
        val hs = names.map(_ => HyperLogLog())
        it.foreach { r =>
          var i = 0
          while (i < names.length) {
            if (!r.isNullAt(i)) hs(i).add(r.getLong(i))
            i += 1
          }
        }
        Iterator.single(hs)
      }
      .reduce((a, b) => a.zip(b).map { case (x, y) => x.merge(y) })

    val cols = fields.zipWithIndex.map { case (f, i) =>
      f.name -> ColumnStats(
        count = rows,
        nulls = row.getAs[Long](s"${f.name}__nulls"),
        min = Option(row.getAs[java.lang.Double](s"${f.name}__min")).map(_.doubleValue),
        max = Option(row.getAs[java.lang.Double](s"${f.name}__max")).map(_.doubleValue),
        minStr = Option(row.getAs[String](s"${f.name}__mins")),
        maxStr = Option(row.getAs[String](s"${f.name}__maxs")),
        ndvSketch = sketches(i),
      )
    }.toMap
    TableStats(rows, cols)
  }
}
