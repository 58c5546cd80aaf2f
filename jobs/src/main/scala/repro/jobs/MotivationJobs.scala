package repro.jobs

import java.nio.file.Files

import repro.core._
import repro.exp._
import repro.lst.LstCatalog
import repro.workload.CabWorkload

/** Figure 2: file size distribution before/after compaction. */
object Fig2FileSizeDist {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig2-filesizedist")
    try {
      val catalog = new LstCatalog(Files.createTempDirectory("fig2-"))
      new CabWorkload(nDbs = 4, hours = 1, seed = 11L, months = 8)
        .setup(spark, catalog, initialSf = 0.05, initialLineitemFiles = 10,
          initialOrdersFiles = 20)
      val target = 512L << 10
      val before = FileSizeDistribution.histogram(catalog, target)
      val pctBefore = FileSizeDistribution.pctBelowTarget(catalog, target / 4)
      val acfg = AutoCompConfig(ScopeStrategy.Hybrid, CompactionConfig(target),
        Seq(Filters.MinSmallFiles(2)), Ranker.defaultMoop, Selector.TopK(1000))
      new AutoComp(catalog).runOnce(spark, acfg)
      val after = FileSizeDistribution.histogram(catalog, target)
      val pctAfter = FileSizeDistribution.pctBelowTarget(catalog, target / 4)
      println(Reports.fig2(before, after, pctBefore, pctAfter))
    } finally spark.stop()
  }
}

/** Figure 3: single-user runtime around a data-maintenance phase. */
object Fig3Maintenance {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("fig3-maintenance")
    try {
      println(Reports.fig3(MaintenanceExperiment.run(spark,
        MaintenanceExperiment.Params(sf = 0.05, months = 6, initialFiles = 4,
          maintenanceAppendSf = 0.0015, maintenanceAppendFiles = 80,
          queryRepeats = 3))))
    } finally spark.stop()
  }
}
