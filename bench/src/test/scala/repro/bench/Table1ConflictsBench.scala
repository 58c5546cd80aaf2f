package repro.bench

import repro.SparkSpec
import repro.exp.Reports

/** Table 1: client- and cluster-side write-write conflicts per execution
  * hour under no compaction, TABLE-scope top-10, and HYBRID top-500.
  *
  * Paper shape: conflicts exist even without compaction (concurrent CAB
  * streams); table-scope compaction inflates both conflict classes early
  * (big rewrites racing user writes over stale metadata), declining as the
  * busy tables get compacted; the hybrid strategy's small sequential
  * partition rewrites produce ZERO (or near-zero) cluster-side conflicts.
  */
class Table1ConflictsBench extends SparkSpec {

  test("Table 1: conflicts per execution hour") {
    val results = CabRuns.results
    println(Reports.table1(results))

    val table10 = CabRuns.byName("table-10")
    val hybrid500 = CabRuns.byName("hybrid-500")
    val nocomp = CabRuns.byName("nocomp")

    // structural invariants
    results.foreach(r => r.hours.foreach { h =>
      assert(h.clientConflicts >= 0 && h.clusterConflicts >= 0)
    })
    assert(nocomp.hours.forall(_.clusterConflicts == 0),
      "no compaction ⇒ no cluster-side conflicts by definition")
    // conflicts do occur under concurrent compaction + CDC updates
    val totalConflicts = results.map(r =>
      r.hours.map(h => h.clientConflicts + h.clusterConflicts).sum).sum
    println(s"total conflicts observed across strategies: $totalConflicts")
    assert(totalConflicts > 0, "expected write-write conflicts under concurrency")
    // shape (slack-tolerant; single-run counts are small): hybrid's small
    // sequential partition rewrites must not conflict much more than
    // table-scope's long whole-table rewrites
    val cluT = table10.hours.map(_.clusterConflicts).sum
    val cluH = hybrid500.hours.map(_.clusterConflicts).sum
    assert(cluH <= cluT + 3,
      s"hybrid cluster conflicts ($cluH) should not exceed table-scope ($cluT) by much")
  }
}
