package repro.bench

import repro.SparkSpec
import repro.exp.Reports

/** Figure 6: live file count over time per compaction strategy.
  *
  * Paper shape: without compaction the count climbs steadily from a high
  * initial load; every compaction strategy produces a sharp initial drop
  * that then flattens; hybrid (partition-scope, smaller k) declines more
  * gradually than aggressive table-scope.
  */
class Fig6FileCountBench extends SparkSpec {

  test("Figure 6: file count over time") {
    val results = CabRuns.results
    println(Reports.fig6(results))

    val nocomp = CabRuns.byName("nocomp")
    val compacted = results.filter(_.strategy != "nocomp")

    // no-compaction baseline grows monotonically
    val counts = nocomp.initialFileCount +: nocomp.hours.map(_.fileCountEnd)
    assert(counts.zip(counts.tail).forall { case (a, b) => b >= a },
      s"nocomp file count must not shrink: $counts")

    // every strategy ends well below the baseline
    compacted.foreach { r =>
      assert(r.hours.last.fileCountEnd < nocomp.hours.last.fileCountEnd * 0.75,
        s"${r.strategy} ended at ${r.hours.last.fileCountEnd}, " +
          s"baseline ${nocomp.hours.last.fileCountEnd}")
    }
    // the full-coverage hybrid drops the count hard
    assert(CabRuns.byName("hybrid-500").hours.last.fileCountEnd <
      nocomp.hours.last.fileCountEnd / 2)
    // fewer entities per round ⇒ a more gradual, controlled decline (§6.1)
    assert(CabRuns.byName("hybrid-50").hours.last.fileCountEnd >=
      CabRuns.byName("hybrid-500").hours.last.fileCountEnd,
      "hybrid with smaller k should reduce files more slowly")

    // compaction hours actually removed files
    compacted.foreach(r =>
      assert(r.hours.map(_.compactionNetReduction).sum > 0, s"${r.strategy} reduced nothing"))
  }
}
