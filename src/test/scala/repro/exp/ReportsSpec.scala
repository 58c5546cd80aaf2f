package repro.exp

import org.scalatest.funsuite.AnyFunSuite

import repro.fleet.DayMetrics
import repro.tune.TuneResult
import repro.workload.LatencySummary

class ReportsSpec extends AnyFunSuite {

  test("render aligns columns and includes all rows") {
    val out = Reports.render("T", Vector("a", "bb"), Vector(
      Vector("1", "2"), Vector("333", "4")))
    val lines = out.split("\n")
    assert(lines.head == "== T ==")
    assert(lines.count(_.startsWith("|")) == 3)
    // all data lines share the same width
    assert(lines.filter(_.startsWith("|")).map(_.length).distinct.size == 1)
  }

  test("render escapes nothing and keeps cell order") {
    val out = Reports.render("t", Vector("h"), Vector(Vector("x")))
    assert(out.contains("| x"))
  }

  test("number formatting helpers") {
    assert(Reports.f1(1.25) == "1.2" || Reports.f1(1.25) == "1.3")
    assert(Reports.f2(3.14159) == "3.14")
    assert(Reports.f3(0.0005) == "0.001")
  }

  test("paperTable1 covers hours 2-5") {
    assert(Reports.paperTable1.keySet == Set(2, 3, 4, 5))
    assert(Reports.paperTable1(2) == ((12, 1, 11, 4, 23, 0)))
  }

  test("fig9 marks the disabled threshold as default") {
    val out = Reports.fig9("x", "note", Vector(
      TuneResult(0, 1.01, 100.0, 100.0), TuneResult(1, 0.5, 80.0, 80.0)))
    assert(out.contains("off(default)"))
    assert(out.contains("0.500"))
  }

  test("fig10a groups days into weeks") {
    val days = (1 to 14).toVector.map(d =>
      DayMetrics(d, "p", 1, 1000000L, 1.0, 10L, 5L, 100L))
    val out = Reports.fig10a(days)
    assert(out.contains("week 1") && out.contains("week 2") && !out.contains("week 3"))
  }

  test("fig10c shows millions") {
    val days = (1 to 7).toVector.map(d =>
      DayMetrics(d, "p", 1, 0L, 0.0, 2500000L, 1000000L, 0L))
    val out = Reports.fig10c(days)
    assert(out.contains("2.50"))
  }

  test("fig11b groups by month length") {
    val days = (1 to 60).toVector.map(d =>
      DayMetrics(d, "p", 0, 0L, 0.0, 0L, 0L, 3000000L))
    val out = Reports.fig11b(days, daysPerMonth = 30)
    assert(out.contains("month 1") && out.contains("month 2"))
    assert(out.contains("3.00"))
  }

  test("fig11a marks compaction days") {
    val out = Reports.fig11a(Vector((1, 100.0, false), (2, 50.0, true)))
    val lines = out.split("\n").filter(_.startsWith("| 2"))
    assert(lines.head.contains("*"))
  }

  test("fig2 includes the below-target summary row") {
    val h = Vector("a" -> 50.0, "b" -> 50.0)
    val out = Reports.fig2(h, h, 83.0, 62.0)
    assert(out.contains("83.0") && out.contains("62.0"))
  }

  test("fig3 normalizes to the initial phase") {
    val out = Reports.fig3(Vector(
      MaintenanceExperiment.PhaseResult("initial", 10.0, 5),
      MaintenanceExperiment.PhaseResult("degraded", 15.3, 50),
      MaintenanceExperiment.PhaseResult("compacted", 10.1, 6)))
    assert(out.contains("1.53"))
  }

  test("LatencySummary integrates with fig8 rows") {
    val s = LatencySummary.of(Vector(1L, 2L, 3L))
    assert(s.n == 3 && s.p50 == 2L)
  }
}
