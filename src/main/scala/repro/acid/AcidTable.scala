package repro.acid

import java.io.File
import java.nio.file.{Files, StandardCopyOption}

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

import repro.metastore.{Catalog, TableDesc, WriteIdList, WriteKind}
import AcidLayout._

/** An ACID table over the base/delta directory layout (§3.2).
  *
  * Rows are uniquely identified by (WriteId, FileId, RowId); the triple is
  * stored with every record. INSERT writes a `delta_w_w` directory; DELETE
  * writes delete markers referencing target row ids into `delete_delta_w_w`;
  * UPDATE is split into a delete plus an insert under the same WriteId, and
  * MERGE combines all three. Readers bind a [[WriteIdList]] snapshot, skip
  * records of invisible writes, and anti-join the visible delete deltas.
  *
  * For partitioned tables each partition value owns a sub-directory
  * (`col=value/`) holding its own base/delta stores, which is what makes
  * partition pruning — static or dynamic — a directory skip.
  */
object AcidTable {
  /** Stride between file-id batches; supports up to ~1M Spark partitions
    * per write, far above anything this repo produces. */
  val FileBatchStride: Long = 1L << 20
  private val fileBatch = new java.util.concurrent.atomic.AtomicLong(0L)
  private[acid] def nextFileBatch(): Long = fileBatch.incrementAndGet()
}

final class AcidTable(val catalog: Catalog, val name: String) {

  private def desc: TableDesc = catalog.table(name)
  private def root: File = new File(desc.location)
  private def store = catalog.txns

  private def partitionCol: Option[StructField] =
    desc.partitionCol.map(pc => desc.schema(pc))

  /** User-visible columns, partition column included. */
  def userColumns: Seq[String] = desc.schema.fieldNames.toSeq

  // ---------------------------------------------------------------- writes

  /** Inserts `df` (must match the table schema) under transaction `txn`.
    * Returns the WriteId used. */
  def insert(txn: Long, df: DataFrame): Long = {
    val w = store.allocateWriteId(txn, name)
    val withIds = assignRowIds(conform(df), w)
    val parts = writeToStore(withIds, deltaName(w, w))
    parts.foreach(p => store.recordWriteSet(txn, name, p, WriteKind.Insert))
    w
  }

  /** Deletes all rows matching `predicate`. Returns the number of rows
    * marked deleted. */
  def delete(txn: Long, predicate: Column)(implicit spark: SparkSession): Long = {
    val w = store.allocateWriteId(txn, name)
    val snap = currentSnapshot()
    val victims = read(snap, includeRowIds = true).filter(predicate)
    writeDeleteMarkers(txn, w, victims)
  }

  /** Updates rows matching `predicate`, applying `set` (column -> new value
    * expression evaluated over the old row). Split into delete + insert
    * under one WriteId, exactly as Hive models updates. */
  def update(txn: Long, predicate: Column, set: Map[String, Column])(
      implicit spark: SparkSession): Long = {
    require(set.nonEmpty, "UPDATE with empty SET")
    desc.partitionCol.foreach(pc =>
      require(!set.contains(pc), s"cannot update partition column $pc"))
    val w = store.allocateWriteId(txn, name)
    val snap = currentSnapshot()
    val victims = read(snap, includeRowIds = true).filter(predicate).cache()
    try {
      val n = writeDeleteMarkers(txn, w, victims)
      if (n > 0) {
        val updated = set.foldLeft(victims) { case (d, (c, expr)) => d.withColumn(c, expr) }
        val withIds = assignRowIds(conform(updated.select(userColumns.map(col): _*)), w)
        val parts = writeToStore(withIds, deltaName(w, w))
        parts.foreach(p => store.recordWriteSet(txn, name, p, WriteKind.Update))
      }
      n
    } finally victims.unpersist()
  }

  /** SQL MERGE: joins `source` on `condition`; matched target rows are
    * updated via `matchedSet` (or deleted when `matchedDelete`), unmatched
    * source rows are inserted when `insertNotMatched`. All actions share a
    * single WriteId, and a source row may match at most one target row. */
  def merge(
      txn: Long,
      source: DataFrame,
      condition: Column,
      matchedSet: Map[String, Column] = Map.empty,
      matchedDelete: Boolean = false,
      insertNotMatched: Boolean = true)(implicit spark: SparkSession): Unit = {
    require(!(matchedSet.nonEmpty && matchedDelete), "MERGE: update and delete are exclusive")
    val w = store.allocateWriteId(txn, name)
    val snap = currentSnapshot()
    val tgt = read(snap, includeRowIds = true).alias("t")
    val src = source.alias("s").cache()
    try {
      val matched = tgt.join(src, condition, "inner").cache()
      try {
        if (matchedSet.nonEmpty || matchedDelete) {
          val n = writeDeleteMarkers(txn, w,
            matched.select((RowIdCols ++ desc.partitionCol.toSeq).map(c => col(s"t.$c")): _*),
            kind = if (matchedDelete) WriteKind.Delete else WriteKind.Update)
          if (n > 0 && matchedSet.nonEmpty) {
            // Qualify target columns explicitly: after the t/s join, bare
            // column names are ambiguous.
            val updatedCols = userColumns.map(c => matchedSet.getOrElse(c, col(s"t.$c")).as(c))
            val rows = conform(matched.select(updatedCols: _*))
            val parts = writeToStore(assignRowIds(rows, w), deltaName(w, w))
            parts.foreach(p => store.recordWriteSet(txn, name, p, WriteKind.Update))
          }
        }
        if (insertNotMatched) {
          val fresh = src.join(tgt, condition, "left_anti")
          val rows = conform(fresh.select(userColumns.map(c => col(s"s.$c").as(c)): _*))
          val parts = writeToStore(assignRowIds(rows, w), deltaName(w, w))
          parts.foreach(p => store.recordWriteSet(txn, name, p, WriteKind.Insert))
        }
      } finally matched.unpersist()
    } finally src.unpersist()
  }

  // ---------------------------------------------------------------- reads

  /** Snapshot of this table for the current transaction state. */
  def currentSnapshot(): WriteIdList = store.writeIdList(name, store.txnList())

  /** Reads the table under snapshot `snap`.
    *
    * @param partitionFilter when set, partition directories whose value does
    *        not satisfy the predicate are skipped entirely (directory-level
    *        pruning; the hook used by dynamic partition pruning in §4.6)
    * @param includeRowIds   keep the ACID row-id columns in the output
    */
  def read(
      snap: WriteIdList,
      partitionFilter: Option[String => Boolean] = None,
      includeRowIds: Boolean = false)(implicit spark: SparkSession): DataFrame = {
    val frames: Seq[DataFrame] = partitionCol match {
      case None => readStore(root, snap, None).toSeq
      case Some(pf) =>
        val dirs = listPartitionDirs(root)
          .filter(d => partitionFilter.forall(p => p(partitionValueOf(d))))
        dirs.flatMap(d => readStore(d, snap, Some(pf -> partitionValueOf(d))))
    }
    val out = frames.reduceOption(_.unionByName(_)).getOrElse(emptyFrame(spark))
    val cols = userColumns ++ (if (includeRowIds) RowIdCols else Seq.empty)
    out.select(cols.map(col): _*)
  }

  /** Convenience: read under a freshly acquired snapshot. */
  def readCurrent()(implicit spark: SparkSession): DataFrame = read(currentSnapshot())

  /** Rows whose WriteId lies in (fromWriteId, snap.highWatermark] — the
    * delta used by incremental materialized-view maintenance (§4.4): the
    * MV definition enriched with WriteId filters over each scan. */
  def readDelta(fromWriteId: Long, snap: WriteIdList)(implicit spark: SparkSession): DataFrame =
    read(snap, includeRowIds = true)
      .filter(col(AcidLayout.WriteIdCol) > fromWriteId)
      .select(userColumns.map(col): _*)

  /** True when any delete markers landed after `fromWriteId` — the signal
    * that incremental (insert-only) maintenance is impossible. */
  def hasDeletesSince(fromWriteId: Long): Boolean =
    storeDirs.exists { case (dir, _) =>
      AcidLayout.list(dir).exists {
        case d: AcidLayout.DeleteDeltaDir => d.hi > fromWriteId
        case _                            => false
      }
    }

  /** Number of partition directories that currently exist on disk. */
  def partitionDirCount: Int = listPartitionDirs(root).size

  /** All store directories: the table root for unpartitioned tables, one
    * entry per partition directory otherwise. Used by the compactor. */
  private[acid] def storeDirs: Seq[(File, Option[String])] = partitionCol match {
    case None    => Seq(root -> None)
    case Some(_) => listPartitionDirs(root).map(d => d -> Some(partitionValueOf(d)))
  }

  private[acid] def tableDesc: TableDesc = desc

  /** Store directory count across the table — drives compaction thresholds. */
  def storeDirCount: Int = partitionCol match {
    case None => AcidLayout.list(root).size
    case Some(_) => listPartitionDirs(root).map(d => AcidLayout.list(d).size).sum
  }

  // ------------------------------------------------------------- internals

  private def partitionValueOf(dir: File): String = dir.getName.split("=", 2)(1)

  private def emptyFrame(spark: SparkSession): DataFrame = {
    val schema = StructType(desc.schema.fields ++ RowIdCols.map(StructField(_, LongType)))
    spark.createDataFrame(spark.sparkContext.emptyRDD[org.apache.spark.sql.Row], schema)
  }

  /** Conforms a frame to the declared schema (order + types). */
  private def conform(df: DataFrame): DataFrame =
    df.select(desc.schema.fields.map(f => col(f.name).cast(f.dataType).as(f.name)).toSeq: _*)

  /** Attaches the (WriteId, FileId, RowId) identity to every row. FileIds
    * embed a per-write batch number so two writes under the same WriteId
    * (e.g. MERGE's update-insert plus not-matched-insert) never collide. */
  private def assignRowIds(df: DataFrame, writeId: Long): DataFrame = {
    val batch = AcidTable.nextFileBatch()
    val staged = df
      .withColumn(FileIdCol, (lit(batch * AcidTable.FileBatchStride) +
        spark_partition_id().cast(LongType)).cast(LongType))
      .withColumn("__mid", monotonically_increasing_id())
    val win = Window.partitionBy(col(FileIdCol)).orderBy(col("__mid"))
    staged
      .withColumn(RowIdCol, row_number().over(win).cast(LongType))
      .withColumn(WriteIdCol, lit(writeId))
      .drop("__mid")
  }

  /** Writes `df` into sub-directory `subdir` of the table (or of each
    * partition for partitioned tables). Returns the partition values
    * touched ("" for unpartitioned). */
  private[acid] def writeToStore(df: DataFrame, subdir: String): Seq[String] =
    partitionCol match {
      case None =>
        df.write.mode("append").parquet(new File(root, subdir).toString)
        Seq("")
      case Some(pf) =>
        val tmp = new File(root, s".tmp_${subdir}_${System.nanoTime()}")
        df.write.partitionBy(pf.name).parquet(tmp.toString)
        val moved = Option(tmp.listFiles()).map(_.toSeq).getOrElse(Seq.empty)
          .filter(d => d.isDirectory && d.getName.startsWith(s"${pf.name}="))
          .map { pd =>
            val target = new File(new File(root, pd.getName), subdir)
            target.getParentFile.mkdirs()
            Files.move(pd.toPath, target.toPath, StandardCopyOption.ATOMIC_MOVE)
            partitionValueOf(pd)
          }
        deleteRecursively(tmp)
        catalog.addPartitions(name, moved)
        moved
    }

  /** Writes delete markers for the victim rows; returns the victim count. */
  private def writeDeleteMarkers(
      txn: Long,
      w: Long,
      victims: DataFrame,
      kind: WriteKind.Value = WriteKind.Delete): Long = {
    val keyCols = RowIdCols ++ desc.partitionCol.toSeq
    val markers = victims
      .select(keyCols.map(col): _*)
      .withColumn(DeleteWriteIdCol, lit(w))
      .cache()
    try {
      val n = markers.count()
      if (n > 0) {
        val parts = writeToStore2(markers, deleteDeltaName(w, w))
        parts.foreach(p => store.recordWriteSet(txn, name, p, kind))
      }
      n
    } finally markers.unpersist()
  }

  /** Like [[writeToStore]] but for delete-marker frames (row-id schema). */
  private def writeToStore2(df: DataFrame, subdir: String): Seq[String] =
    partitionCol match {
      case None =>
        df.write.mode("append").parquet(new File(root, subdir).toString)
        Seq("")
      case Some(pf) =>
        val tmp = new File(root, s".tmp_${subdir}_${System.nanoTime()}")
        df.write.partitionBy(pf.name).parquet(tmp.toString)
        val moved = Option(tmp.listFiles()).map(_.toSeq).getOrElse(Seq.empty)
          .filter(d => d.isDirectory && d.getName.startsWith(s"${pf.name}="))
          .map { pd =>
            val target = new File(new File(root, pd.getName), subdir)
            target.getParentFile.mkdirs()
            Files.move(pd.toPath, target.toPath, StandardCopyOption.ATOMIC_MOVE)
            partitionValueOf(pd)
          }
        deleteRecursively(tmp)
        moved
    }

  /** Reads one store directory (table root or a single partition dir) and
    * returns 0 or 1 frames carrying user columns + row-id columns. */
  private def readStore(
      dir: File,
      snap: WriteIdList,
      partition: Option[(StructField, String)])(
      implicit spark: SparkSession): Option[DataFrame] = {
    val dirs = AcidLayout.list(dir)
    if (dirs.isEmpty) return None

    val bases = dirs.collect { case b: BaseDir => b }
    val chosenBase = bases
      .filter(b => b.writeId <= snap.highWatermark && !snap.invalid.exists(_ <= b.writeId))
      .sortBy(_.writeId).lastOption
    val floor = chosenBase.map(_.writeId).getOrElse(0L)

    val deltas = dirs.collect { case d: DeltaDir if d.hi > floor => d }
    val deleteDeltas = dirs.collect { case d: DeleteDeltaDir if d.hi > floor => d }

    def readDir(f: File): DataFrame = spark.read.parquet(f.toString)

    val visible = udf((w: Long) => snap.isVisible(w))
    val dataFrames =
      chosenBase.map(b => readDir(b.path)).toSeq ++ deltas.map(d => readDir(d.path))
    if (dataFrames.isEmpty) return None

    val dataCols = desc.schema.fields.toSeq
      .filterNot(f => desc.partitionCol.contains(f.name))
      .map(_.name) ++ RowIdCols
    var data = dataFrames
      .map(_.select(dataCols.map(col): _*))
      .reduce(_.unionByName(_))
      .filter(visible(col(WriteIdCol)))

    if (deleteDeltas.nonEmpty) {
      val dels = deleteDeltas
        .map(d => readDir(d.path).select((RowIdCols :+ DeleteWriteIdCol).map(col): _*))
        .reduce(_.unionByName(_))
        .filter(visible(col(DeleteWriteIdCol)))
        .select(RowIdCols.map(col): _*)
      data = data.join(dels, RowIdCols, "left_anti")
    }

    val withPartition = partition match {
      case Some((pf, value)) => data.withColumn(pf.name, lit(value).cast(pf.dataType))
      case None              => data
    }
    Some(withPartition)
  }
}
