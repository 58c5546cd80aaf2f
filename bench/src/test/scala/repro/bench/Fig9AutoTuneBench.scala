package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.exp.Reports
import repro.tune.{Tuner, WorkloadModel}

/** Figure 9: auto-tuning compaction triggers with an MLOS/FLAML-style
  * optimizer over three LST-Bench workloads and two traits.
  *
  * Paper shapes: (a) TPC-DS WP1 benefits up to 2× from a well-chosen
  * small-file-count threshold; (b) TPC-H is best with the default (no
  * auto-compaction) because rewrites hit whole non-partitioned tables;
  * (c) the entropy trigger reaches results comparable to the small-file-
  * count trigger; (d) TPC-DS WP3 (decoupled read/write clusters) benefits
  * consistently across thresholds.
  */
class Fig9AutoTuneBench extends AnyFunSuite {

  private val tuner = new Tuner(seed = 2024L)
  private val iters = 25

  test("Figure 9a: TPC-DS WP1, small-file-count trigger") {
    val r = tuner.optimize(WorkloadModel.wp1, "smallFileCount", iters)
    println(Reports.fig9("wp1/smallFileCount",
      "paper: up to 2x gain when tables get too fragmented", r))
    val gain = r.head.durationSec / r.map(_.durationSec).min
    println(f"wp1 smallFileCount gain over default: $gain%.2fx (paper: up to 2x)")
    assert(gain > 1.4)
  }

  test("Figure 9b: TPC-H — default (no auto-compaction) is best") {
    val r = tuner.optimize(WorkloadModel.tpch, "smallFileCount", iters)
    println(Reports.fig9("tpch/smallFileCount",
      "paper: default setting performs best; whole-table rewrites too costly", r))
    assert(r.head.durationSec == r.map(_.durationSec).min)
  }

  test("Figure 9c: TPC-DS WP1, entropy trigger comparable to count trigger") {
    val rc = tuner.optimize(WorkloadModel.wp1, "smallFileCount", iters)
    val re = tuner.optimize(WorkloadModel.wp1, "fileEntropy", iters)
    println(Reports.fig9("wp1/fileEntropy",
      "paper: comparable query performance to the small-file-count trigger", re))
    val bc = rc.map(_.durationSec).min
    val be = re.map(_.durationSec).min
    println(f"best wp1 durations — count: $bc%.1f s, entropy: $be%.1f s")
    assert(math.abs(bc - be) / math.max(bc, be) < 0.15)
  }

  test("Figure 9d: TPC-DS WP3 — consistent benefits") {
    val r = tuner.optimize(WorkloadModel.wp3, "smallFileCount", iters)
    println(Reports.fig9("wp3/smallFileCount",
      "paper: decoupled clusters see consistent benefits from compaction", r))
    val default = r.head.durationSec
    val improving = r.tail.count(_.durationSec < default)
    println(s"wp3: $improving/${r.tail.size} iterations beat the default")
    assert(improving > r.tail.size / 2)
  }
}
