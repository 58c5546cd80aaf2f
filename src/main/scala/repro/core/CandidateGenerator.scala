package repro.core

import repro.lst.{LstCatalog, LstTable}

/** Candidate generation (first box of Figure 4): enumerate compaction work
  * units across the catalog at the configured scope. Output order is
  * deterministic (sorted by table, then partition) per NFR2.
  */
object CandidateGenerator {

  /** Candidates for one table at the given scope, frozen at the table's
    * current version.
    */
  def forTable(table: LstTable, scope: Scope): Vector[Candidate] = {
    val snap = table.currentSnapshot
    scope match {
      case Scope.Table =>
        Vector(Candidate(table.ref, Scope.Table, None, snap.files, snap.version))
      case Scope.Partition =>
        snap.files.groupBy(_.partition).toVector
          .sortBy(_._1.getOrElse(""))
          .map { case (part, files) =>
            Candidate(table.ref, Scope.Partition, part, files, snap.version)
          }
      case s @ Scope.SnapshotTail(n) =>
        val cutoff = math.max(0L, snap.version - n)
        val fresh = snap.files.filter(_.addedVersion > cutoff)
        Vector(Candidate(table.ref, s, None, fresh, snap.version))
    }
  }

  /** Enumerate candidates across the whole catalog under a strategy. The
    * paper's hybrid strategy scopes partitioned tables at the partition
    * level and unpartitioned tables at the table level (§6).
    */
  def generate(catalog: LstCatalog, strategy: ScopeStrategy): Vector[Candidate] =
    catalog.allTables.sortBy(_.toString).flatMap { ref =>
      val t = catalog.table(ref)
      val scope = strategy match {
        case ScopeStrategy.TableScope       => Scope.Table
        case ScopeStrategy.PartitionScope   => Scope.Partition
        case ScopeStrategy.Hybrid =>
          if (t.meta.partitionColumn.isDefined) Scope.Partition else Scope.Table
        case ScopeStrategy.SnapshotScope(n) => Scope.SnapshotTail(n)
      }
      forTable(t, scope)
    }
}
