package repro.core

import org.apache.spark.sql.SparkSession

import repro.lst.LstCatalog

/** End-to-end AutoComp configuration: one value per OODA phase. */
final case class AutoCompConfig(
    strategy: ScopeStrategy,
    cfg: CompactionConfig,
    filters: Seq[CandidateFilter],
    ranker: Ranker,
    selector: Selector,
    scheduler: SchedulerConfig = SchedulerConfig())

/** One run's full, explainable record (NFR2): counts at every phase
  * boundary plus per-work-unit results and the feedback-loop observation
  * (post-act file counts per touched table).
  */
final case class AutoCompReport(
    generated: Int,
    filteredOut: Map[String, Int],
    ranked: Int,
    selected: Vector[ScoredCandidate],
    results: Vector[CompactionResult],
    feedbackFileCounts: Map[String, Int]) {
  def totalGbHr: Double = results.map(_.gbHr).sum
  def filesRemoved: Int = results.map(_.removedFiles).sum
  def filesAdded: Int = results.map(_.addedFiles).sum
  def netFileReduction: Int = filesRemoved - filesAdded
  def clusterConflicts: Int = results.map(_.conflicts).sum
  def bytesRewritten: Long = results.map(_.bytesRewritten).sum
  def succeededUnits: Int = results.count(r => r.succeeded && !r.skipped)
  def failedUnits: Int = results.count(!_.succeeded)
}

/** The AutoComp framework (Figure 4): observe → orient → decide → act with
  * optional inter-phase filters and a feedback observation. Stateless across
  * runs — every run re-observes the catalog, so it serves both the periodic
  * ("pull") and post-write ("push") execution modes (§5).
  */
final class AutoComp(catalog: LstCatalog) {

  def runOnce(spark: SparkSession, acfg: AutoCompConfig): AutoCompReport = {
    // Candidate generation
    val candidates = CandidateGenerator.generate(catalog, acfg.strategy)
    // Observe: statistics per candidate (incl. entropy in custom stats)
    val observed = candidates.map { c =>
      val (stats, _) = Traits.observeAndOrient(c, acfg.cfg)
      (c, stats)
    }
    // Inter-phase filtering
    val (kept, rejected) = Filters.apply(observed, acfg.filters)
    // Orient + decide: trait computation lives inside the ranker so that
    // normalization sees exactly the surviving pool
    val ranked = acfg.ranker.rank(kept, acfg.cfg)
    val selected = acfg.selector.select(ranked, acfg.cfg)
    // Act
    val results = new CompactionScheduler(acfg.scheduler).run(spark, catalog, selected, acfg.cfg)
    // Feedback loop: re-observe touched tables
    val feedback = results.map(_.table).distinct.map { ref =>
      ref.toString -> catalog.table(ref).currentSnapshot.fileCount
    }.toMap
    AutoCompReport(candidates.size, rejected, ranked.size, selected, results, feedback)
  }
}

/** Post-write ("push") trigger (§5 Optimize-After-Write): evaluated after
  * every write commit; when the configured trait crosses its threshold the
  * affected table is compacted immediately (unconstrained mode — §6.3 uses
  * exactly this with small-file-count and entropy traits).
  */
final class OptimizeAfterWriteHook(
    catalog: LstCatalog,
    trait_ : TraitCalc,
    threshold: Double,
    asRatioOfFiles: Boolean,
    cfg: CompactionConfig,
    maxRetries: Int = 3) {

  @volatile var triggered: Int = 0

  /** Returns the compaction result when the trigger fired, None otherwise. */
  def onWrite(spark: SparkSession, db: String, name: String): Option[CompactionResult] = {
    val table = catalog.table(db, name)
    val cand = CandidateGenerator.forTable(table, Scope.Table).head
    val (stats, traits) = Traits.observeAndOrient(cand, cfg)
    val raw = traits(trait_.name)
    val v = if (asRatioOfFiles && stats.fileCount > 0) raw / stats.fileCount else raw
    if (v >= threshold) {
      triggered += 1
      Some(CompactionExecutor.compact(spark, catalog, cand, cfg, maxRetries))
    } else None
  }
}

/** Periodic ("pull") trigger (§5): a standalone service tick that runs the
  * whole pipeline. Benches call this once per simulated hour.
  */
final class PeriodicTrigger(autoComp: AutoComp, acfg: AutoCompConfig) {
  private var ticks: Int = 0
  def tickCount: Int = ticks
  def onTick(spark: SparkSession): AutoCompReport = {
    ticks += 1
    autoComp.runOnce(spark, acfg)
  }
}
