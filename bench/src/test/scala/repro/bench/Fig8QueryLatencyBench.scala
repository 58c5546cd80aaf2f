package repro.bench

import repro.SparkSpec
import repro.exp.Reports

/** Figure 8: query latency candlesticks per hour, read-only and
  * read-write, per strategy.
  *
  * Paper shape: hour 1 is similar everywhere; from hour 2 onward compaction
  * improves latency and reduces variability, fastest under the aggressive
  * table-scope strategy. The mechanism is files-scanned-per-query, which we
  * assert on directly (wall-clock medians are also printed but are noisy on
  * a laptop-scale substrate).
  */
class Fig8QueryLatencyBench extends SparkSpec {

  test("Figure 8: query latency per hour") {
    val results = CabRuns.results
    println(Reports.fig8(results))

    val nocomp = CabRuns.byName("nocomp")
    def lateMeanFiles(name: String): Double = {
      val hs = CabRuns.byName(name).hours.filter(_.hour >= 3)
      hs.map(_.meanFilesScannedPerRead).sum / hs.size
    }
    // from hour 3 on, every compaction strategy scans fewer files per read
    // than the baseline — the paper's latency mechanism (partial-k
    // strategies improve less than the full-coverage hybrid)
    Vector("table-10", "hybrid-50", "hybrid-500").foreach { s =>
      assert(lateMeanFiles(s) < lateMeanFiles("nocomp") * 0.8,
        s"$s files/read ${lateMeanFiles(s)} vs nocomp ${lateMeanFiles("nocomp")}")
    }
    assert(lateMeanFiles("hybrid-500") < lateMeanFiles("nocomp") / 2)
    // latencies were actually measured
    results.foreach(r => r.hours.foreach(h => assert(h.readLatency.n > 0)))
    assert(nocomp.hours.forall(_.readLatency.max >= nocomp.hours.head.readLatency.min))
  }
}
