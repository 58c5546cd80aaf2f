package repro.core

import java.util.concurrent.{Callable, Executors, TimeUnit}
import scala.jdk.CollectionConverters._

import org.apache.spark.sql.SparkSession

import repro.lst.LstCatalog

/** Scheduling policy for the act phase (§4.4/§6 "Candidate Selection and
  * Scheduling"): candidates of DIFFERENT tables run in parallel, while
  * candidates of the SAME table (partition work units) run sequentially —
  * the paper observed Iceberg v1.2 rejecting concurrent rewrites even on
  * disjoint partitions, so intra-table parallelism only burns retries.
  */
final case class SchedulerConfig(tableParallelism: Int = 4, maxRetriesPerCandidate: Int = 3) {
  require(tableParallelism >= 1)
}

final class CompactionScheduler(sched: SchedulerConfig) {

  /** Execute the selected work units; returns one result per candidate in
    * deterministic (candidate id) order regardless of thread timing.
    */
  def run(spark: SparkSession, catalog: LstCatalog,
          selected: Vector[ScoredCandidate], cfg: CompactionConfig): Vector[CompactionResult] = {
    if (selected.isEmpty) return Vector.empty
    val byTable = selected.groupBy(_.candidate.table).toVector.sortBy(_._1.toString)
    val pool = Executors.newFixedThreadPool(math.min(sched.tableParallelism, byTable.size))
    try {
      val tasks = byTable.map { case (_, cands) =>
        new Callable[Vector[CompactionResult]] {
          def call(): Vector[CompactionResult] =
            // sequential within a table — see class doc
            cands.map(sc => CompactionExecutor.compact(
              spark, catalog, sc.candidate, cfg, sched.maxRetriesPerCandidate))
        }
      }
      val results = pool.invokeAll(tasks.asJava).asScala.toVector.flatMap(_.get())
      results.sortBy(r => (r.table.toString, r.partition.getOrElse("")))
    } finally {
      pool.shutdown()
      pool.awaitTermination(10, TimeUnit.MINUTES)
    }
  }
}
