package repro.tune

import repro.core.{CompactionConfig, Traits}
import repro.util.DetRng

/** A tunable workload: evaluate returns the end-to-end duration (seconds)
  * of running it with an optimize-after-write compaction trigger firing at
  * `threshold` on the named trait (§6.3). `threshold > 1` effectively
  * disables auto-compaction (the "default" configuration in Fig. 9).
  */
trait TunableWorkload {
  def name: String
  def evaluate(traitName: String, threshold: Double): Double
}

/** Analytic LST-Bench workload model driving the Figure-9 experiments.
  *
  * The paper tunes thresholds over multi-hour cluster runs; each Figure-9
  * iteration cost hours of a 16-node cluster. We replace the cluster with a
  * calibrated cost model over the same state machine: per-table file counts
  * evolve through write phases, queries cost `queryBaseSec +
  * perFileMsSec × filesScanned` (the scan-amplification relationship the
  * real substrate exhibits — validated against actual Spark scans in
  * `WorkloadModelSpec`), and compaction costs rewrite-bytes/throughput,
  * scaled by `contention` when it shares the cluster with queries.
  *
  * Workload archetypes (LST-Bench):
  *   - `wp1`  — TPC-DS WP1: long-running, frequent data modifications on
  *     partitioned tables, compaction competes with queries (contention 1).
  *   - `wp3`  — TPC-DS WP3: decoupled read/write clusters — compaction
  *     overlaps with reads, contention ≈ 0.15.
  *   - `tpch` — TPC-H: NON-partitioned tables and a dominant data-
  *     modification phase; compaction must rewrite whole tables.
  */
final case class WorkloadModel(
    name: String,
    nTables: Int,
    partitionsPerTable: Int, // 1 = non-partitioned (whole-table rewrites)
    phases: Int,
    queriesPerPhase: Int,
    writesPerPhase: Int,
    filesPerWrite: Int,
    fileSizeMb: Double,
    queryBaseSec: Double,
    perFileSec: Double,
    rewriteSecPerGb: Double,
    contention: Double,
    initialSmallFiles: Int,
    initialLargeFiles: Int,
    seed: Long = 11L,
    cfg: CompactionConfig = CompactionConfig(512L << 20)) extends TunableWorkload {

  /** Per-table state: (smallFiles, largeFiles). Small files have
    * `fileSizeMb`; large files sit at target.
    */
  def evaluate(traitName: String, threshold: Double): Double = {
    // The op sequence is a property of the WORKLOAD, not of the trigger
    // being tuned — seed it independently of traitName so different traits
    // are compared on identical runs.
    val rng = new DetRng(seed)
    val small = Array.fill(nTables)(initialSmallFiles)
    val large = Array.fill(nTables)(initialLargeFiles)
    var duration = 0.0

    def traitValue(t: Int): Double = {
      val sizes = Seq.fill(small(t))((fileSizeMb * (1L << 20)).toLong) ++
        Seq.fill(large(t))(cfg.targetFileSizeBytes)
      traitName match {
        case "fileEntropy" => Traits.entropyOf(sizes, cfg.targetFileSizeBytes)
        case _             => // small-file-count ratio, in [0,1] like entropy
          if (sizes.isEmpty) 0.0 else small(t).toDouble / sizes.size
      }
    }

    def compact(t: Int): Unit = {
      // bin-pack small files to target; non-partitioned tables (the TPC-H
      // case) must rewrite the WHOLE table — Iceberg's rewrite reshuffles
      // the one big unpartitioned layout (§6.3 observation (i))
      val smallGb = small(t) * fileSizeMb / 1024.0
      val rewriteGb =
        if (partitionsPerTable == 1) smallGb + large(t) * (cfg.targetFileSizeBytes.toDouble / (1L << 30))
        else smallGb
      duration += rewriteGb * rewriteSecPerGb * contention
      val produced = math.max(1, math.ceil(smallGb * (1L << 30) / cfg.targetFileSizeBytes).toInt)
      large(t) += produced
      small(t) = 0
    }

    (1 to phases).foreach { _ =>
      // query sub-phase
      (1 to queriesPerPhase).foreach { _ =>
        val t = rng.nextInt(nTables)
        duration += queryBaseSec + perFileSec * (small(t) + large(t))
      }
      // data-modification sub-phase with optimize-after-write hook
      (1 to writesPerPhase).foreach { _ =>
        val t = rng.nextInt(nTables)
        small(t) += filesPerWrite
        duration += 2.0 + filesPerWrite * 0.05 // write cost itself
        if (traitValue(t) >= threshold) compact(t)
      }
    }
    duration
  }
}

object WorkloadModel {

  /** TPC-DS WP1-like: fragmentation grows fast, queries dominate → the
    * right threshold pays for itself (paper: up to 2× query-time gain).
    */
  def wp1: WorkloadModel = WorkloadModel(
    name = "tpcds-wp1", nTables = 12, partitionsPerTable = 24,
    phases = 10, queriesPerPhase = 60, writesPerPhase = 25,
    filesPerWrite = 40, fileSizeMb = 16.0,
    queryBaseSec = 4.0, perFileSec = 0.05, rewriteSecPerGb = 1.2,
    contention = 1.0, initialSmallFiles = 100, initialLargeFiles = 96)

  /** TPC-DS WP3-like: decoupled read/write clusters — compaction barely
    * contends with queries.
    */
  def wp3: WorkloadModel = wp1.copy(name = "tpcds-wp3", contention = 0.15)

  /** TPC-H-like: NON-partitioned 100 GB-scale tables (200 × 512 MB), a
    * dominant data-modification phase and few queries with mild scan
    * amplification → any trigger forces repeated whole-table rewrites that
    * cost far more than they save (§6.3 observation (i)).
    */
  def tpch: WorkloadModel = WorkloadModel(
    name = "tpch", nTables = 8, partitionsPerTable = 1,
    phases = 10, queriesPerPhase = 5, writesPerPhase = 60,
    filesPerWrite = 10, fileSizeMb = 16.0,
    queryBaseSec = 4.0, perFileSec = 0.01, rewriteSecPerGb = 2.0,
    contention = 1.0, initialSmallFiles = 40, initialLargeFiles = 200)
}
