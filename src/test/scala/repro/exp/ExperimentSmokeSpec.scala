package repro.exp

import repro.lst.LstFixture

/** Integration smoke tests: the experiment harnesses behind the benches,
  * exercised end-to-end at tiny scale.
  */
class ExperimentSmokeSpec extends LstFixture {

  private val tiny = CabExperiment.Params(
    nDbs = 2, hours = 2, seed = 9, months = 3,
    appendSf = 0.0005, appendFiles = 3,
    initialSf = 0.001, initialLineitemFiles = 3, initialOrdersFiles = 4,
    targetFileSizeBytes = 512L << 10)

  test("CabExperiment nocomp baseline grows the file count") {
    val res = CabExperiment.runStrategy(spark, tiny, CabExperiment.StrategyDef("nocomp", None))
    assert(res.hours.size == 2)
    assert(res.hours.last.fileCountEnd > res.initialFileCount)
    assert(res.hours.forall(_.clusterConflicts == 0))
    assert(res.hours.forall(_.compactionUnits == 0))
  }

  test("CabExperiment with table-scope compaction reduces files vs baseline") {
    val strategies = CabExperiment.paperStrategies(tiny)
    val nocomp = CabExperiment.runStrategy(spark, tiny, strategies(0))
    val table10 = CabExperiment.runStrategy(spark, tiny, strategies(1))
    assert(table10.hours.last.fileCountEnd < nocomp.hours.last.fileCountEnd)
    assert(table10.hours.exists(_.compactionUnits > 0))
    assert(table10.meanGbHrPerUnit > 0.0)
  }

  test("CabExperiment records write counts and latency summaries") {
    val res = CabExperiment.runStrategy(spark, tiny, CabExperiment.StrategyDef("nocomp", None))
    res.hours.foreach { h =>
      assert(h.writeQueries > 0)
      assert(h.readLatency.n > 0)
      assert(h.readLatency.max >= h.readLatency.p50)
      assert(h.meanFilesScannedPerRead > 0.0)
    }
  }

  test("paperStrategies defines the §6 sweep") {
    val s = CabExperiment.paperStrategies(tiny)
    assert(s.map(_.name) == Vector("nocomp", "table-10", "hybrid-50", "hybrid-500"))
    assert(s.head.acfg.isEmpty && s.tail.forall(_.acfg.isDefined))
  }

  test("MaintenanceExperiment: maintenance degrades, compaction restores (Fig 3 shape)") {
    val p = MaintenanceExperiment.Params(
      sf = 0.01, months = 3, initialFiles = 3,
      maintenanceAppendSf = 0.0005, maintenanceAppendFiles = 40,
      queryRepeats = 2, targetFileSizeBytes = 4L << 20)
    val phases = MaintenanceExperiment.run(spark, p)
    assert(phases.map(_.phase) == Vector("initial", "degraded", "compacted"))
    val Vector(initial, degraded, compacted) = phases
    assert(degraded.liveFiles > initial.liveFiles * 3,
      s"maintenance must fragment: ${initial.liveFiles} -> ${degraded.liveFiles}")
    assert(compacted.liveFiles < degraded.liveFiles / 2)
    assert(degraded.seconds > initial.seconds,
      s"fragmentation must slow the single-user phase: ${initial.seconds} -> ${degraded.seconds}")
  }

  test("FileSizeDistribution histogram sums to ~100% and shifts after compaction") {
    val c = freshCatalog()
    val w = new repro.workload.CabWorkload(2, 1, seed = 4, months = 3)
    w.setup(spark, c, initialSf = 0.002, initialLineitemFiles = 6, initialOrdersFiles = 8)
    val target = 512L << 10
    val before = FileSizeDistribution.histogram(c, target)
    assert(math.abs(before.map(_._2).sum - 100.0) < 1e-6)
    def meanSizeAndCount(): (Double, Long) = {
      val sizes = c.allTables.flatMap(r => c.table(r).currentSnapshot.files.map(_.sizeBytes))
      (sizes.sum.toDouble / sizes.size, sizes.size.toLong)
    }
    val (meanBefore, nBefore) = meanSizeAndCount()
    val acfg = repro.core.AutoCompConfig(
      repro.core.ScopeStrategy.TableScope, CabExperiment.compactionConfig(tiny),
      Seq(repro.core.Filters.MinSmallFiles(2)),
      repro.core.Ranker.defaultMoop, repro.core.Selector.TopK(100))
    new repro.core.AutoComp(c).runOnce(spark, acfg)
    val (meanAfter, nAfter) = meanSizeAndCount()
    assert(nAfter < nBefore / 2, s"file count must drop: $nBefore -> $nAfter")
    assert(meanAfter > meanBefore * 2,
      s"distribution must shift toward the target: mean $meanBefore -> $meanAfter")
  }
}
