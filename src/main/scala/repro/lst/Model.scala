package repro.lst

/** Identity of a table inside an [[LstCatalog]]. */
final case class TableRef(db: String, name: String) {
  override def toString: String = s"$db.$name"
}

/** One immutable data file tracked by the table metadata.
  *
  * @param path       absolute path of the Parquet file on the local FS
  * @param partition  partition value ("1992-03") or None for unpartitioned
  *                   tables; every row in the file belongs to this partition
  * @param sizeBytes  physical file size
  * @param recordCount exact row count (from the Parquet footer)
  * @param addedVersion table version whose commit added this file
  */
final case class DataFile(
    path: String,
    partition: Option[String],
    sizeBytes: Long,
    recordCount: Long,
    addedVersion: Long)

/** A committed table version: the complete data-file inventory after the
  * commit, Iceberg-snapshot style (manifests merged into one list).
  *
  * @param version      monotonically increasing table version (v0 = empty)
  * @param operation    one of [[Snapshot.OpAppend]] / [[Snapshot.OpOverwrite]]
  *                     / [[Snapshot.OpRewrite]] / [[Snapshot.OpCreate]]
  * @param timestampMs  wall-clock commit time (informational only)
  * @param files        full file inventory at this version
  * @param addedCount   files added by this commit
  * @param removedCount files removed by this commit
  */
final case class Snapshot(
    version: Long,
    operation: String,
    timestampMs: Long,
    files: Vector[DataFile],
    addedCount: Int,
    removedCount: Int) {

  def fileCount: Int = files.size
  def totalBytes: Long = files.iterator.map(_.sizeBytes).sum
  def totalRecords: Long = files.iterator.map(_.recordCount).sum
  def partitions: Vector[String] = files.flatMap(_.partition).distinct.sorted
  def filesIn(partition: Option[String]): Vector[DataFile] =
    partition.fold(files)(p => files.filter(_.partition.contains(p)))
}

object Snapshot {
  val OpCreate = "create"
  val OpAppend = "append"
  /** User read-modify-write (CoW delete/update): removes and adds files. */
  val OpOverwrite = "overwrite"
  /** Maintenance rewrite (compaction): data-equivalent file replacement. */
  val OpRewrite = "rewrite"
}

/** Per-table static metadata stored in `meta/table.json`.
  *
  * @param partitionColumn name of the derived partition column (e.g. the
  *                        month of l_shipdate) or None for unpartitioned
  * @param schemaJson      Spark StructType JSON captured at first append so
  *                        empty-table scans stay typed
  */
final case class TableMeta(
    db: String,
    name: String,
    partitionColumn: Option[String],
    createdAtMs: Long,
    schemaJson: Option[String])

/** A write operation submitted to [[LstTable.commit]]. */
sealed trait CommitOp {
  def added: Vector[DataFile]
  def operation: String
}

/** Pure addition of files; never conflicts (rebases onto the current
  * snapshot like Iceberg fast-append).
  */
final case class Append(added: Vector[DataFile]) extends CommitOp {
  def operation: String = Snapshot.OpAppend
}

/** User CoW delete/update: replace `removedPaths` with `added`. Conflicts if
  * any removed file is no longer present (another writer got there first).
  */
final case class Overwrite(removedPaths: Vector[String], added: Vector[DataFile]) extends CommitOp {
  def operation: String = Snapshot.OpOverwrite
}

/** Compaction rewrite: replace `removedPaths` with data-equivalent `added`.
  * Mirrors the coarse Apache Iceberg v1.2 validation observed in the paper
  * (§4.4): a rewrite conflicts with ANY intervening overwrite or rewrite on
  * the table — even one touching disjoint partitions — while pure appends
  * rebase cleanly.
  */
final case class Rewrite(removedPaths: Vector[String], added: Vector[DataFile]) extends CommitOp {
  def operation: String = Snapshot.OpRewrite
}

/** Optimistic-concurrency failure. `kind` distinguishes the paper's two
  * conflict classes: "client" (user write lost a race, §6.2 Table 1 left)
  * and "cluster" (compaction commit rejected, Table 1 right).
  */
final class CommitConflictException(val table: TableRef, val kind: String, msg: String)
    extends RuntimeException(s"[$kind] conflict on $table: $msg")
