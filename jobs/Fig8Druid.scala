package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.bench.BenchRunners

/** spark-submit entrypoint reproducing **Figure 8** (§7.3) as a table:
  * the 13 SSB queries answered from a denormalized materialized view
  * stored natively vs stored in (simulated) Druid with Calcite-style
  * computation pushdown.
  *
  * Usage: spark-submit --class repro.jobs.Fig8Druid <jar> [scaleFactor]
  */
object Fig8Druid {
  def main(args: Array[String]): Unit = {
    val sf = args.headOption.map(_.toDouble).getOrElse(0.1)
    val spark = SparkSession.builder
      .appName("fig8-druid")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val r = BenchRunners.runFig8(spark, sf)
      println(BenchRunners.renderMode(
        s"Figure 8 — SSB-lite SF=$sf, MV native vs MV in Druid", Seq(r.native, r.druid)))
      println(s"Queries pushed down to Druid: ${r.pushedQueries}/13")
      println(f"Paper:    Hive/Druid 1.6x faster than the MV stored natively")
      println(f"Measured: native ${r.native.totalMs} ms vs Druid ${r.druid.totalMs} ms -> ${r.speedup}%.2fx")
    } finally spark.stop()
  }
}
