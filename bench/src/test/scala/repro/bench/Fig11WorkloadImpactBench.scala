package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.exp.{FleetExperiments, Reports}

/** Figure 11: impact of AutoComp on workload metrics and HDFS.
  *
  * Paper: (a) for AutoComp-selected tables, compaction cycles cut files
  * scanned, query time, and query cost together; cycles in which a table
  * is NOT selected re-accumulate small files — a sawtooth. (b) fleet-wide
  * filesystem open() calls drop sharply when manual compaction lands
  * (month 4) and further when auto-compaction rolls out (month 9).
  */
class Fig11WorkloadImpactBench extends AnyFunSuite {

  test("Figure 11a: sawtooth of files scanned for AutoComp-selected tables") {
    val cohort = FleetExperiments.runFig11a()
    println(Reports.fig11a(cohort))

    val series = cohort.map(_._2)
    // sawtooth: the series must both rise and fall repeatedly
    val deltas = series.zip(series.tail).map { case (a, b) => b - a }
    val ups = deltas.count(_ > 0); val downs = deltas.count(_ < 0)
    println(s"sawtooth: $ups rising days, $downs falling days")
    assert(ups >= 3 && downs >= 3,
      s"expected a sawtooth (rises AND falls): ups=$ups downs=$downs")
    // compaction days exist and are where the drops happen
    assert(cohort.exists(_._3))
  }

  test("Figure 11b: open() calls drop at month 4 (manual) and month 9 (auto)") {
    val days = FleetExperiments.runFig11b()
    println(Reports.fig11b(days, daysPerMonth = 30))

    def monthMean(m: Int): Double = {
      val ds = days.slice((m - 1) * 30, m * 30)
      ds.map(_.openCalls).sum.toDouble / ds.size
    }
    // months 1-3 (no maintenance): open() calls grow
    assert(monthMean(3) > monthMean(1))
    // manual compaction lands in month 4: sharp decline vs month 3
    assert(monthMean(5) < monthMean(3),
      f"manual compaction must cut open() calls: ${monthMean(3)}%.3e -> ${monthMean(5)}%.3e")
    // auto from month 9: a further drop below the manual plateau
    assert(monthMean(11) < monthMean(8),
      f"auto-compaction must cut further: ${monthMean(8)}%.3e -> ${monthMean(11)}%.3e")
  }
}
