package repro.lst

import java.nio.file.{Files, Path}
import scala.jdk.CollectionConverters._

import org.apache.hadoop.conf.Configuration
import org.apache.parquet.hadoop.ParquetFileReader
import org.apache.parquet.hadoop.util.HadoopInputFile
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Write path for [[LstTable]]: stages Parquet files with a *controllable
  * file count* (the knob that makes small-file proliferation reproducible),
  * adopts them into the table, and commits with optimistic concurrency.
  *
  * All writes are real Spark jobs — `df.write.parquet` through Catalyst —
  * so produced files have genuine Parquet sizes/footers, which downstream
  * traits (ΔF, entropy, GBHr) consume.
  */
object LstWriter {

  /** Outcome of a logical write, including its optimistic-concurrency
    * retry history (conflicts = number of CommitConflictExceptions absorbed).
    */
  final case class WriteResult(
      table: TableRef,
      snapshot: Snapshot,
      addedFiles: Int,
      addedBytes: Long,
      removedFiles: Int,
      attempts: Int,
      conflicts: Int,
      succeeded: Boolean)

  /** Exact row count from the Parquet footer (cheap metadata read). */
  def parquetRecordCount(p: Path): Long = {
    val in = HadoopInputFile.fromPath(
      new org.apache.hadoop.fs.Path(p.toUri), new Configuration())
    val r = ParquetFileReader.open(in)
    try r.getRecordCount finally r.close()
  }

  /** Stage `df` as Parquet under the table's tmp dir and adopt the produced
    * files into `data/`, returning their [[DataFile]] entries (tagged with
    * partition values when the table is partitioned).
    *
    * For a partitioned table, `df` MUST contain `meta.partitionColumn`; we
    * write with `partitionBy` so every physical file holds exactly one
    * partition value, and aim for `filesTarget` files per touched partition
    * via a salted repartition. The partition column is a *derived* column
    * (e.g. month-of-shipdate) so dropping it from file contents loses no
    * source data. For an unpartitioned table, `filesTarget` is the total
    * file count.
    */
  def stage(spark: SparkSession, table: LstTable, df: DataFrame,
            filesTarget: Int, seed: Long, baseVersion: Long): Vector[DataFile] = {
    require(filesTarget >= 1, s"filesTarget must be >= 1: $filesTarget")
    val tmp = table.tmpDir.resolve(java.util.UUID.randomUUID().toString)
    val partCol = table.meta.partitionColumn
    partCol match {
      case Some(pc) =>
        require(df.columns.contains(pc), s"partitioned table ${table.ref} needs column $pc")
        // Round-robin into `filesTarget` tasks; partitionBy then splits each
        // task's rows per partition value, yielding exactly `filesTarget`
        // files per touched partition (when rows per partition >= target) —
        // the controllable small-file knob. An explicit partition count also
        // keeps AQE from coalescing tiny shuffles down to one file.
        df.repartition(filesTarget).write.mode("overwrite").partitionBy(pc)
          .parquet(tmp.toUri.toString)
      case None =>
        df.repartition(filesTarget).write.mode("overwrite").parquet(tmp.toUri.toString)
    }
    table.setSchemaIfAbsent(df.drop(partCol.toSeq: _*).schema.json)

    val staged: Vector[(Path, Option[String])] = Files.walk(tmp).iterator.asScala
      .filter(p => p.getFileName.toString.endsWith(".parquet"))
      .map { p =>
        val part = partCol.map { pc =>
          val dir = p.getParent.getFileName.toString // "<pc>=<value>"
          dir.stripPrefix(s"$pc=")
        }
        (p, part)
      }.toVector.sortBy(_._1.toString)

    val adopted = staged.map { case (p, part) =>
      val count = parquetRecordCount(p)
      val target = table.adoptStagedFile(p)
      DataFile(target.toString, part, Files.size(target), count, baseVersion + 1)
    }
    // best-effort tmp cleanup
    if (Files.exists(tmp))
      Files.walk(tmp).iterator.asScala.toVector.reverse.foreach(Files.deleteIfExists(_))
    adopted
  }

  /** Append `df` to the table. Appends rebase, so a single commit attempt
    * suffices (the LST never rejects a fast-append).
    */
  def append(spark: SparkSession, table: LstTable, df: DataFrame,
             filesTarget: Int, seed: Long = 0): WriteResult = {
    val base = table.currentVersion
    val added = stage(spark, table, df, filesTarget, seed, base)
    val snap = table.commit(base, Append(added))
    WriteResult(table.ref, snap, added.size, added.map(_.sizeBytes).sum, 0, 1, 0, succeeded = true)
  }

  /** Copy-on-write delete of roughly `rowFraction` of the rows held by a
    * sample of the table's files (all files of `partition` when given,
    * otherwise `fileSample` of the whole table).
    *
    * Mirrors engine CoW semantics: affected files are fully rewritten minus
    * the deleted rows, producing *smaller, uneven* files (§2 "Updates and
    * Deletes"). The deletion predicate hashes all columns, so it is
    * deterministic in (seed) and independent of file layout — a retry after
    * a conflict deletes the same logical rows from the re-planned files.
    *
    * On [[CommitConflictException]] (another writer removed our victim
    * files) the operation re-plans against the fresh snapshot and retries up
    * to `maxRetries` times; each failed attempt counts as one client-side
    * conflict (Table 1, left columns).
    */
  def deleteFraction(spark: SparkSession, table: LstTable, rowFraction: Double,
                     partition: Option[String], fileSample: Double = 1.0,
                     seed: Long = 0, maxRetries: Int = 5): WriteResult = {
    require(rowFraction >= 0 && rowFraction <= 1, s"bad rowFraction $rowFraction")
    var attempts = 0
    var conflicts = 0
    while (attempts <= maxRetries) {
      attempts += 1
      val base = table.currentVersion
      val snap = table.snapshotAt(base)
      val pool = snap.filesIn(partition)
      val nVictims = math.max(1, math.round(pool.size * fileSample).toInt)
      val victims = pool.sortBy(_.path).take(math.min(nVictims, pool.size))
      if (victims.isEmpty)
        return WriteResult(table.ref, snap, 0, 0, 0, attempts, conflicts, succeeded = true)

      val byPart = victims.groupBy(_.partition).toVector.sortBy(_._1.getOrElse(""))
      val schemaCols = spark.read.parquet(victims.head.path).columns
      val keep = not(pmod(xxhash64(schemaCols.map(col).toSeq: _*), lit(10000L))
        .lt(lit(math.round(rowFraction * 10000))))

      val added = byPart.flatMap { case (part, group) =>
        val remaining = spark.read.parquet(group.map(_.path): _*).filter(keep)
        stageForPartition(spark, table, remaining, part, group.size, seed, base)
      }
      try {
        val next = table.commit(base, Overwrite(victims.map(_.path), added))
        return WriteResult(table.ref, next, added.size, added.map(_.sizeBytes).sum,
          victims.size, attempts, conflicts, succeeded = true)
      } catch {
        case _: CommitConflictException => conflicts += 1 // re-plan and retry
      }
    }
    WriteResult(table.ref, table.currentSnapshot, 0, 0, 0, attempts, conflicts, succeeded = false)
  }

  /** Stage `df` (already restricted to one partition, or unpartitioned) as
    * exactly-`nFiles`-ish Parquet files tagged with `part`. Used by the CoW
    * delete path and by the compaction executor, which both operate on one
    * partition group at a time and therefore bypass `partitionBy`.
    */
  def stageForPartition(spark: SparkSession, table: LstTable, df: DataFrame,
                        part: Option[String], nFiles: Int, seed: Long,
                        baseVersion: Long): Vector[DataFile] = {
    val tmp = table.tmpDir.resolve(java.util.UUID.randomUUID().toString)
    df.repartition(math.max(1, nFiles)).write.mode("overwrite").parquet(tmp.toUri.toString)
    val staged = Files.walk(tmp).iterator.asScala
      .filter(p => p.getFileName.toString.endsWith(".parquet"))
      .toVector.sortBy(_.toString)
    val adopted = staged.flatMap { p =>
      val count = parquetRecordCount(p)
      if (count == 0L) { Files.deleteIfExists(p); None } // drop empty splits
      else {
        val target = table.adoptStagedFile(p)
        Some(DataFile(target.toString, part, Files.size(target), count, baseVersion + 1))
      }
    }
    if (Files.exists(tmp))
      Files.walk(tmp).iterator.asScala.toVector.reverse.foreach(Files.deleteIfExists(_))
    adopted
  }
}
