package repro.acid

import java.io.File

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import AcidLayout._

/** Minor/major compaction for ACID tables (§3.2).
  *
  * Minor compaction merges delta directories into a single wider-range
  * delta (same for delete deltas); major compaction folds base + deltas −
  * delete markers into a fresh `base_hi` and deletes history. Compaction
  * never blocks queries: new directories are written first and superseded
  * ones are removed in a separate *cleaning* phase, mirroring Hive's
  * split between merging and cleaning.
  *
  * The compaction horizon `hi` is the highest WriteId below the lowest
  * write of any still-open transaction; records of aborted transactions at
  * or below `hi` are physically dropped and their bookkeeping is purged
  * from the metastore, shrinking future snapshots.
  */
final class Compactor(table: AcidTable) {

  private def store = table.catalog.txns

  /** Auto-trigger criterion used by HS2: compact when any store directory
    * accumulates at least `minDeltas` delta directories. */
  def shouldCompact(minDeltas: Int): Boolean =
    table.storeDirs.exists { case (dir, _) =>
      AcidLayout.list(dir).count {
        case _: DeltaDir | _: DeleteDeltaDir => true
        case _                               => false
      } >= minDeltas
    }

  /** Compaction horizon for this table: everything <= hi is stable. */
  private def horizon(): Long = {
    val openW = store.openWrites(table.name)
    val hwm = table.currentSnapshot().highWatermark
    if (openW.isEmpty) hwm else openW.min - 1
  }

  /** Runs minor compaction on every store directory. Returns the number of
    * directories merged away (post-cleaning). */
  def minorCompact()(implicit spark: SparkSession): Int = {
    val hi = horizon()
    val snap = table.currentSnapshot()
    val visible = udf((w: Long) => snap.isVisible(w))
    table.storeDirs.map { case (dir, _) =>
      val dirs = AcidLayout.list(dir)
      val baseFloor = dirs.collect { case b: BaseDir => b.writeId }.maxOption.getOrElse(0L)
      val deltas = dirs.collect { case d: DeltaDir if d.lo > baseFloor && d.hi <= hi => d }
      val dels = dirs.collect { case d: DeleteDeltaDir if d.lo > baseFloor && d.hi <= hi => d }

      var cleaned = 0
      if (deltas.size > 1) {
        val lo = deltas.map(_.lo).min; val h = deltas.map(_.hi).max
        mergeDirs(deltas.map(_.path), new File(dir, deltaName(lo, h)),
          df => df.filter(visible(col(WriteIdCol))))
        deltas.foreach(d => deleteRecursively(d.path))
        cleaned += deltas.size
      }
      if (dels.size > 1) {
        val lo = dels.map(_.lo).min; val h = dels.map(_.hi).max
        mergeDirs(dels.map(_.path), new File(dir, deleteDeltaName(lo, h)),
          df => df.filter(visible(col(DeleteWriteIdCol))))
        dels.foreach(d => deleteRecursively(d.path))
        cleaned += dels.size
      }
      cleaned
    }.sum
  }

  /** Runs major compaction on every store directory, then purges aborted
    * write bookkeeping at or below the horizon. */
  def majorCompact()(implicit spark: SparkSession): Unit = {
    val hi = horizon()
    if (hi <= 0) return
    val snap = table.currentSnapshot()
    val visible = udf((w: Long) => snap.isVisible(w))
    table.storeDirs.foreach { case (dir, _) =>
      val dirs = AcidLayout.list(dir)
      val bases = dirs.collect { case b: BaseDir => b }
      val baseFloor = bases.map(_.writeId).maxOption.getOrElse(0L)
      if (baseFloor < hi || dirs.exists {
            case d: DeltaDir       => d.hi > baseFloor
            case d: DeleteDeltaDir => d.hi > baseFloor
            case _                 => false
          }) {
        val chosen = bases.filter(_.writeId <= hi).sortBy(_.writeId).lastOption
        val floor = chosen.map(_.writeId).getOrElse(0L)
        val deltas = dirs.collect { case d: DeltaDir if d.hi > floor && d.hi <= hi => d }
        val delDirs = dirs.collect { case d: DeleteDeltaDir if d.hi > floor && d.hi <= hi => d }

        val parts = chosen.map(_.path).toSeq ++ deltas.map(_.path)
        // hi == floor means nothing stable beyond the existing base: skip.
        if (hi > floor && parts.nonEmpty) {
          var data = parts
            .map(p => spark.read.parquet(p.toString))
            .reduce(_.unionByName(_))
            .filter(visible(col(WriteIdCol)))
          if (delDirs.nonEmpty) {
            val markers = delDirs
              .map(p => spark.read.parquet(p.path.toString))
              .reduce(_.unionByName(_))
              .filter(visible(col(DeleteWriteIdCol)))
              .select(RowIdCols.map(col): _*)
            data = data.join(markers, RowIdCols, "left_anti")
          }
          data.write.parquet(new File(dir, baseName(hi)).toString)
          // cleaning phase: drop everything the new base supersedes
          (chosen.toSeq.map(_.path) ++ deltas.map(_.path) ++ delDirs.map(_.path))
            .foreach(deleteRecursively)
        }
      }
    }
    store.forgetAbortedWrites(table.name, hi)
  }

  private def mergeDirs(src: Seq[File], target: File, transform: DataFrame => DataFrame)(
      implicit spark: SparkSession): Unit = {
    val merged = src.map(p => spark.read.parquet(p.toString)).reduce(_.unionByName(_))
    transform(merged).write.parquet(target.toString)
  }
}
