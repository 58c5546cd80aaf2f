package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.exp.{FleetExperiments, Reports}

/** Figure 10: AutoComp behavior and impact on file count in the LinkedIn
  * OpenHouse deployment (35K tables), reproduced on the fleet simulator
  * with the real `repro.core` ranking/selection code.
  *
  * Paper numbers: (a) manual k=100 averaged 6.59M files reduced vs 7.44M
  * for AutoComp k=10 (+12%) at higher cost; (b) a 226 TBHr budget yields
  * k≈2500 tables per iteration; (c) fleet-wide file count declines despite
  * deployment growth.
  */
class Fig10FleetBench extends AnyFunSuite {

  test("Figure 10a: manual k=100 → AutoComp k=10 transition") {
    val days = FleetExperiments.runFig10a()
    println(Reports.fig10a(days))

    val weekly = days.grouped(7).map(_.map(_.filesReduced).sum / 1e6).toVector
    // steady-state comparison: manual week 2 (post initial backlog-clear)
    // vs auto weeks 4-6 mean
    val manualSteady = weekly(1)
    val autoSteady = weekly.drop(3).sum / 3
    println(f"steady weekly reduction — manual-100: $manualSteady%.2fM, " +
      f"auto-10: $autoSteady%.2fM (+${100 * (autoSteady / manualSteady - 1)}%.1f%% vs " +
      "paper: 6.59M -> 7.44M, +12%)")
    assert(autoSteady > manualSteady,
      s"auto top-10 must out-reduce manual top-100 in steady state despite 10x fewer tables")
    // "higher effectiveness AND higher computation cost": cost per
    // compaction APPLICATION jumps — auto's 10 picks are far heavier than
    // manual's routine re-compactions
    def tbHrPerApp(ds: Vector[repro.fleet.DayMetrics]): Double =
      ds.map(_.tbHrSpent).sum / ds.map(_.kCompacted).sum
    val manualApps = tbHrPerApp(days.slice(7, 14))
    val autoApps = tbHrPerApp(days.drop(21))
    println(f"TBHr per application — manual: $manualApps%.3f, auto: $autoApps%.3f")
    assert(autoApps > manualApps, "auto applications must cost more each")
  }

  test("Figure 10b: dynamic k under a 226 TBHr budget") {
    val days = FleetExperiments.runFig10b()
    println(Reports.fig10b(days))
    val budgetDays = days.filter(_.policy.startsWith("auto-budget"))
    val fixedDays = days.filter(_.policy == "auto-10")
    assert(fixedDays.forall(_.kCompacted == 10))
    assert(budgetDays.forall(_.tbHrSpent <= 226.0 + 1e-6))
    val kLast = budgetDays.takeRight(3).map(_.kCompacted)
    println(s"dynamic k in final days: $kLast (paper: ≈2500)")
    assert(kLast.forall(k => k > 200 && k < 20000),
      s"dynamic k should reach the thousands ballpark: $kLast")
  }

  test("Figure 10c: fleet file count declines once auto-compaction lands") {
    val days = FleetExperiments.runFig10c()
    println(Reports.fig10c(days))
    // growth slopes: unchecked growth > manual-slowed growth; the auto
    // phase (600 TBHr ≈ peak capacity) turns the curve downward
    val slopeNoComp = (days(13).totalFiles - days(0).totalFiles) / 13.0
    val slopeManual = (days(41).totalFiles - days(14).totalFiles) / 27.0
    val slopeAuto = (days.last.totalFiles - days(42).totalFiles) / 41.0
    println(f"daily file-count slope — nocomp: ${slopeNoComp / 1e6}%.2fM, " +
      f"manual: ${slopeManual / 1e6}%.2fM, auto: ${slopeAuto / 1e6}%.2fM")
    assert(slopeManual < slopeNoComp, "manual compaction must slow the growth")
    assert(slopeAuto < slopeManual, "auto must improve on manual")
    assert(slopeAuto < 0, "auto at peak capacity must make the fleet shrink")
  }
}
