package repro.exp

import java.nio.file.Files

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.SynthData
import repro.core._
import repro.lst._

/** The §2 motivating experiment (Figure 3): a single-user query phase, a
  * data-maintenance phase that modifies ~3% of the data (CoW deletes +
  * fragmented inserts), a degraded re-run, manual compaction, and a
  * restored re-run. The paper measured 1.53× degradation on TPC-DS SF1000;
  * we reproduce the SHAPE (degraded ≫ initial, restored ≈ initial) on
  * TPC-H-lite.
  */
object MaintenanceExperiment {

  final case class PhaseResult(phase: String, seconds: Double, liveFiles: Long)

  final case class Params(
      sf: Double = 0.05,
      months: Int = 6,
      initialFiles: Int = 4,
      maintenanceDeleteFraction: Double = 0.03,
      maintenanceAppendSf: Double = 0.0015, // ~3% of sf
      maintenanceAppendFiles: Int = 60,
      queryRepeats: Int = 3,
      targetFileSizeBytes: Long = 4L << 20,
      seed: Long = 13L)

  /** The single-user phase: a fixed battery of read queries, repeated. */
  private def singleUserPhase(spark: SparkSession, catalog: LstCatalog, p: Params): Double = {
    val li = catalog.table("tpch", "lineitem")
    val ord = catalog.table("tpch", "orders")
    val t0 = System.nanoTime()
    (1 to p.queryRepeats).foreach { _ =>
      val liScan = LstReader.scan(spark, li).df
      val ordScan = LstReader.scan(spark, ord).df
      liScan.groupBy(col("l_returnflag"), col("l_linestatus"))
        .agg(sum(col("l_quantity")), sum(col("l_extendedprice")),
          avg(col("l_discount")), count(lit(1))).collect()
      ordScan.groupBy(col("o_orderstatus")).agg(count(lit(1)), sum(col("o_totalprice"))).collect()
      liScan.join(ordScan, col("l_orderkey") === col("o_orderkey"))
        .groupBy(col("o_orderstatus"))
        .agg(sum(col("l_extendedprice") * (lit(1) - col("l_discount")))).collect()
      liScan.filter(col("l_shipdate") < lit("1992-03-01"))
        .agg(sum(col("l_extendedprice") * col("l_discount"))).collect()
    }
    (System.nanoTime() - t0) / 1e9
  }

  private def liveFiles(catalog: LstCatalog): Long =
    catalog.allTables.map(r => catalog.table(r).currentSnapshot.fileCount.toLong).sum

  def run(spark: SparkSession, p: Params = Params()): Vector[PhaseResult] = {
    val catalog = new LstCatalog(Files.createTempDirectory("maint-"))
    val li = catalog.createTable("tpch", "lineitem", Some("l_shipmonth"), nowMs = 0L)
    val ord = catalog.createTable("tpch", "orders", None, nowMs = 0L)
    LstWriter.append(spark, li,
      SynthData.lineitemMonthly(spark, p.sf, p.months, p.seed), p.initialFiles, p.seed)
    LstWriter.append(spark, ord, SynthData.orders(spark, p.sf, p.seed + 1), p.initialFiles, p.seed)

    val out = Vector.newBuilder[PhaseResult]
    // Unmeasured warmup: JIT + codegen caches would otherwise inflate the
    // first measured phase and mask the fragmentation effect.
    singleUserPhase(spark, catalog, p)
    out += PhaseResult("initial", singleUserPhase(spark, catalog, p), liveFiles(catalog))

    // Maintenance: ~3% deleted (CoW) + fragmented incremental inserts
    LstWriter.deleteFraction(spark, li, p.maintenanceDeleteFraction, None, 1.0, p.seed + 2)
    LstWriter.deleteFraction(spark, ord, p.maintenanceDeleteFraction, None, 1.0, p.seed + 3)
    LstWriter.append(spark, li,
      SynthData.lineitemMonthly(spark, p.maintenanceAppendSf, p.months, p.seed + 4),
      p.maintenanceAppendFiles, p.seed + 4)
    LstWriter.append(spark, ord,
      SynthData.orders(spark, p.maintenanceAppendSf, p.seed + 5),
      p.maintenanceAppendFiles, p.seed + 5)

    out += PhaseResult("degraded", singleUserPhase(spark, catalog, p), liveFiles(catalog))

    // Manual compaction (table scope, both tables)
    val cfg = CompactionConfig(p.targetFileSizeBytes)
    catalog.allTables.foreach { ref =>
      val cand = CandidateGenerator.forTable(catalog.table(ref), Scope.Table).head
      CompactionExecutor.compact(spark, catalog, cand, cfg)
    }

    out += PhaseResult("compacted", singleUserPhase(spark, catalog, p), liveFiles(catalog))
    out.result()
  }
}
