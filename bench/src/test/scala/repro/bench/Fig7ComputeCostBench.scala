package repro.bench

import repro.SparkSpec
import repro.exp.Reports

/** Figure 7: mean GBHr per compaction application per strategy.
  *
  * Paper shape: table-level compaction rewrites whole fragmented tables —
  * effective but expensive and spiky per application; partition-scope
  * (hybrid) applications are cheaper and more stable, spreading resource
  * usage over time.
  */
class Fig7ComputeCostBench extends SparkSpec {

  test("Figure 7: mean GBHr per compaction application") {
    val results = CabRuns.results
    println(Reports.fig7(results))

    val table10 = CabRuns.byName("table-10")
    val hybrid500 = CabRuns.byName("hybrid-500")

    assert(table10.meanGbHrPerUnit > 0 && hybrid500.meanGbHrPerUnit > 0)
    // a table-scope application rewrites strictly more than a partition-
    // scope application of the same data
    assert(table10.meanGbHrPerUnit > hybrid500.meanGbHrPerUnit,
      s"table-scope mean ${table10.meanGbHrPerUnit} should exceed " +
        s"hybrid ${hybrid500.meanGbHrPerUnit}")
    // ...and with more per-application variance
    assert(table10.gbHrStdDev >= hybrid500.gbHrStdDev,
      s"table-scope stddev ${table10.gbHrStdDev} vs hybrid ${hybrid500.gbHrStdDev}")
  }
}
