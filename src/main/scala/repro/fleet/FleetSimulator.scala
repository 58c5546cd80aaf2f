package repro.fleet

import repro.core._
import repro.lst.TableRef
import repro.util.DetRng

/** Mutable per-table state in the fleet simulation. File sizes are tracked
  * as (count, mean MB) aggregates — at 35K-table scale the per-file
  * inventory is irrelevant to the *policy* results the paper reports.
  *
  * @param writeRatePerDay  steady small-file creation (trickle writes)
  * @param scanRatePerDay   scan-heavy queries/day touching every live file
  *                         (the HDFS open()-calls driver of Fig. 11)
  */
final case class FleetTable(
    db: Int,
    id: Int,
    var smallFiles: Long,
    var largeFiles: Long,
    var avgSmallFileMb: Double,
    var writeRatePerDay: Double,
    scanRatePerDay: Double) {
  def totalFiles: Long = smallFiles + largeFiles
  def smallBytes: Long = (smallFiles * avgSmallFileMb * (1L << 20)).toLong
}

/** Compaction policy active on a given day (§7). */
sealed trait Policy { def name: String }
object Policy {
  /** No maintenance at all (pre-month-4 state in Fig. 11b). */
  case object NoComp extends Policy { val name = "nocomp" }
  /** Ad-hoc manual strategy: a FIXED set of k tables (chosen by
    * fragmentation when the policy activates) recompacted daily.
    */
  final case class ManualFixed(k: Int) extends Policy { val name = s"manual-$k" }
  /** AutoComp with quota-weighted MOOP ranking and fixed top-k. */
  final case class AutoTopK(k: Int) extends Policy { val name = s"auto-$k" }
  /** AutoComp with dynamic k bounded by a daily TBHr budget. */
  final case class AutoBudget(tbHr: Double) extends Policy { val name = s"auto-budget-$tbHr" }
}

/** One simulated day's fleet-level metrics. */
final case class DayMetrics(
    day: Int,
    policy: String,
    kCompacted: Int,
    filesReduced: Long,
    tbHrSpent: Double,
    totalFiles: Long,
    totalSmallFiles: Long,
    openCalls: Long)

/** Fleet knobs; defaults calibrated so fleet-level magnitudes land in the
  * paper's ballpark (§7: ~35K tables, millions of files reduced weekly,
  * 226 TBHr ⇒ k≈2500). See EXPERIMENTS.md for the calibration notes.
  */
final case class FleetConfig(
    nTables: Int = 35000,
    nDbs: Int = 60,
    seed: Long = 7L,
    targetFileMb: Double = 512.0,
    execMemGb: Double = 16.0,
    rewriteTbPerHour: Double = 1.0,
    /** Pareto tail exponent for initial fragmentation & burst sizes. */
    paretoAlpha: Double = 1.3,
    /** Mean of initial per-table small-file counts (heavy-tailed). */
    initialSmallFilesScale: Double = 800.0,
    /** Fragmentation bursts/day fleet-wide (migrations, backfills, CDC). */
    burstsPerDay: Int = 120,
    burstScale: Double = 5000.0,
    /** Cap on a single burst (multiples of burstScale). */
    burstCapFactor: Double = 60.0,
    dbQuotaObjects: Long = 2_000_000L,
    /** Observe-phase filter: tables below this small-file count are not
      * auto-compaction candidates (the OpenHouse "too small to matter"
      * rule) — this is what makes a TBHr budget BIND at a finite k.
      */
    minSmallFilesCandidate: Long = 2L,
    /** Per-candidate compute-cost ceiling in TBHr (§4.2: candidates whose
      * cost exceeds the allocation are "automatically discarded or flagged
      * for further review"). Infinite by default.
      */
    maxCandidateTbHr: Double = Double.MaxValue,
    /** Daily probability that a table's write activity is re-drawn — the
      * fleet churn (§7: "users interact with the system on a daily basis
      * by modifying their data, creating new tables, and adjusting
      * workflows") that makes a FIXED manual set go stale.
      */
    writeRateChurnPerDay: Double = 0.0)

/** Day-granularity simulation of the LinkedIn OpenHouse deployment (§7).
  * The DECISION code is the real `repro.core` pipeline — quota-weighted
  * MOOP ranking, top-k / budget-greedy selection — applied to synthesized
  * fleet statistics; only growth and the act phase are modeled analytically.
  */
final class FleetSimulator(cfg: FleetConfig) {

  private val compactionCfg = CompactionConfig(
    targetFileSizeBytes = (cfg.targetFileMb * (1L << 20)).toLong,
    executorMemoryGb = cfg.execMemGb,
    rewriteBytesPerHour = cfg.rewriteTbPerHour * (1L << 40))

  /** Bounded Pareto draw (heavy tail, capped to keep the sim stable). */
  private def pareto(rng: DetRng, scale: Double, cap: Double): Double =
    math.min(cap, scale / math.pow(1.0 - rng.nextDouble(), 1.0 / cfg.paretoAlpha) - scale + 1.0)

  /** Deterministic initial fleet. Fragmentation is CORRELATED with write
    * activity (active tables are the fragmented ones), which is what keeps
    * the manual fixed set regrowing in §7 rather than going quiet after its
    * first cleanup.
    */
  def initialFleet(): Vector[FleetTable] = {
    val rng = new DetRng(cfg.seed)
    (0 until cfg.nTables).toVector.map { i =>
      val writeRate = pareto(rng.split(i + 4000000), 30.0, 2e4)
      val activity = writeRate / 30.0
      val small = (pareto(rng.split(i), cfg.initialSmallFilesScale, 1e5) * activity).toLong
      FleetTable(
        db = rng.split(i + 1000000).nextInt(cfg.nDbs),
        id = i,
        smallFiles = small,
        largeFiles = 50 + rng.split(i + 2000000).nextInt(400),
        avgSmallFileMb = 4.0 + rng.split(i + 3000000).nextDouble() * 60.0,
        writeRatePerDay = writeRate,
        scanRatePerDay = 0.2 + rng.split(i + 5000000).nextDouble() * 2.8)
    }
  }

  /** Cumulative writeRate^1.5 weights: fragmentation bursts (backfills,
    * CDC storms, migrations) hit ACTIVE tables far more often than idle
    * ones.
    */
  private def burstWeights(tables: Vector[FleetTable]): Array[Double] = {
    val cum = new Array[Double](tables.size)
    var acc = 0.0
    var i = 0
    while (i < tables.size) {
      acc += math.pow(tables(i).writeRatePerDay, 1.5)
      cum(i) = acc
      i += 1
    }
    cum
  }

  private def grow(tables: Vector[FleetTable], day: Int): Unit = {
    val rng = new DetRng(DetRng.combine(cfg.seed, day.toLong, 0xfeedL))
    // churn: some workflows change hands/shape — activity re-drawn
    if (cfg.writeRateChurnPerDay > 0) {
      val churnRng = rng.split(0x4151L)
      tables.foreach { t =>
        if (churnRng.nextDouble() < cfg.writeRateChurnPerDay)
          t.writeRatePerDay = pareto(churnRng, 30.0, 2e4)
      }
    }
    tables.foreach(t => t.smallFiles += math.round(t.writeRatePerDay))
    val cumWeights = burstWeights(tables)
    val total = cumWeights.last
    (0 until cfg.burstsPerDay).foreach { b =>
      val r = rng.split(b)
      val u = r.nextDouble() * total
      val idx = {
        val i = java.util.Arrays.binarySearch(cumWeights, u)
        if (i >= 0) i else -(i + 1)
      }
      val t = tables(math.min(idx, tables.size - 1))
      t.smallFiles += pareto(r, cfg.burstScale, cfg.burstScale * cfg.burstCapFactor).toLong
    }
  }

  /** Rank with the production configuration: MOOP (0.7/0.3 base) with the
    * §7 quota-scaled benefit weight w1 = 0.5·(1 + used/total), clamped.
    */
  private def rankAll(tables: Vector[FleetTable]): Vector[ScoredCandidate] = {
    val usedByDb: Map[Int, Long] =
      tables.groupBy(_.db).map { case (db, ts) => db -> ts.map(_.totalFiles).sum }
    def w1(c: Candidate): Double = {
      val db = c.table.db.stripPrefix("db").toInt
      val ratio = math.min(1.0, usedByDb(db).toDouble / cfg.dbQuotaObjects)
      0.5 * (1.0 + ratio)
    }
    val costCapGbHr = cfg.maxCandidateTbHr * 1024.0
    def costGbHr(t: FleetTable): Double =
      cfg.execMemGb * (t.smallBytes.toDouble / (cfg.rewriteTbPerHour * (1L << 40)))
    val pool = tables
      .filter(t => t.smallFiles >= cfg.minSmallFilesCandidate && costGbHr(t) <= costCapGbHr)
      .map { t =>
      val cand = Candidate(TableRef(s"db${t.db}", s"t${t.id}"), Scope.Table, None, Vector.empty, 0L)
      val stats = CandidateStats(
        fileCount = t.totalFiles.toInt.max(0),
        smallFileCount = t.smallFiles.toInt.max(0),
        totalBytes = t.smallBytes + t.largeFiles * (cfg.targetFileMb * (1L << 20)).toLong,
        smallBytes = t.smallBytes,
        minFileBytes = 0L, maxFileBytes = 0L)
      (cand, stats)
    }
    Ranker.MoopRanker(
      Vector(Traits.FileCountReduction -> 0.7, Traits.ComputeCostGbHr -> 0.3),
      weightOverride = Some(w1)).rank(pool, compactionCfg)
  }

  /** Apply the act phase to one table: bin-pack its small files to target.
    * Returns (fileReduction, tbHr).
    */
  private def compactTable(t: FleetTable): (Long, Double) = {
    if (t.smallFiles < 2) return (0L, 0.0)
    val produced = math.max(1L, math.ceil(t.smallBytes.toDouble /
      (cfg.targetFileMb * (1L << 20))).toLong)
    val reduction = math.max(0L, t.smallFiles - produced)
    val gbHr = cfg.execMemGb * (t.smallBytes.toDouble / (cfg.rewriteTbPerHour * (1L << 40)))
    t.largeFiles += produced
    t.smallFiles = 0
    (reduction, gbHr / 1024.0) // → TBHr
  }

  /** Run `days` days under a policy schedule: `schedule(d)` is the policy
    * that becomes active on day d (1-based); days without an entry keep the
    * previous policy. Returns one [[DayMetrics]] per day.
    *
    * @param onDay observer invoked after each day's compaction with
    *   (day, fleet state, tables picked today) — used by the Fig. 11a bench
    *   to extract per-table sawtooth trajectories.
    */
  def run(days: Int, schedule: Map[Int, Policy],
          onDay: (Int, Vector[FleetTable], Vector[FleetTable]) => Unit = (_, _, _) => ())
      : Vector[DayMetrics] = {
    require(schedule.contains(1), "schedule must define the day-1 policy")
    val tables = initialFleet()
    val byId = tables.map(t => t.id -> t).toMap
    var policy: Policy = schedule(1)
    var manualSet: Vector[Int] = Vector.empty

    def activate(p: Policy): Unit = {
      policy = p
      p match {
        case Policy.ManualFixed(k) =>
          // infra engineers pick the currently most fragmented tables — once
          manualSet = tables.sortBy(-_.smallFiles).take(k).map(_.id)
        case _ => ()
      }
    }
    activate(policy)

    (1 to days).toVector.map { day =>
      schedule.get(day).filter(_ => day > 1).foreach(activate)
      grow(tables, day)

      val picked: Vector[FleetTable] = policy match {
        case Policy.NoComp          => Vector.empty
        case Policy.ManualFixed(_)  => manualSet.map(byId)
        case Policy.AutoTopK(k)     =>
          rankAll(tables).take(k).map(sc => byId(sc.candidate.table.name.stripPrefix("t").toInt))
        case Policy.AutoBudget(tb)  =>
          // reuse the real budget-greedy selector (budget in GBHr)
          Selector.BudgetGreedy(tb * 1024.0).select(rankAll(tables), compactionCfg)
            .map(sc => byId(sc.candidate.table.name.stripPrefix("t").toInt))
      }

      val outcomes = picked.map(compactTable)
      onDay(day, tables, picked)
      val openCalls = tables.iterator.map(t => t.scanRatePerDay * t.totalFiles).sum.toLong
      DayMetrics(
        day = day,
        policy = policy.name,
        kCompacted = picked.size,
        filesReduced = outcomes.map(_._1).sum,
        tbHrSpent = outcomes.map(_._2).sum,
        totalFiles = tables.iterator.map(_.totalFiles).sum,
        totalSmallFiles = tables.iterator.map(_.smallFiles).sum,
        openCalls = openCalls)
    }
  }
}
