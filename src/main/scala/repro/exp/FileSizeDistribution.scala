package repro.exp

import repro.lst.LstCatalog

/** Figure-2 analogue: bucketed file-size distribution across a catalog,
  * before vs after compaction (buckets scaled 1:1024 from the paper's
  * production axis, i.e. `<8K … ≥512K` here ≙ `<8M … ≥512M` there).
  */
object FileSizeDistribution {

  final case class Bucket(label: String, upperBytes: Long)

  /** Log-2 buckets up to and including the target size. */
  def buckets(targetBytes: Long): Vector[Bucket] = {
    val steps = Vector(64, 16, 4, 1) // fractions of target: <T/64, <T/16, <T/4, <T
    steps.map(f => Bucket(s"<target/$f", targetBytes / f)) :+
      Bucket(">=target", Long.MaxValue)
  }

  /** Percentage of live files per bucket (sums to ~100). */
  def histogram(catalog: LstCatalog, targetBytes: Long): Vector[(String, Double)] = {
    val sizes = catalog.allTables.flatMap(r =>
      catalog.table(r).currentSnapshot.files.map(_.sizeBytes))
    val bs = buckets(targetBytes)
    if (sizes.isEmpty) return bs.map(b => b.label -> 0.0)
    val out = Vector.newBuilder[(String, Double)]
    var prevUpper = Long.MinValue
    bs.foreach { b =>
      val n = sizes.count(s => s >= prevUpper && s < b.upperBytes)
      out += b.label -> (100.0 * n / sizes.size)
      prevUpper = b.upperBytes
    }
    out.result()
  }

  /** The paper's headline metric: share of files below the target size. */
  def pctBelowTarget(catalog: LstCatalog, targetBytes: Long): Double = {
    val sizes = catalog.allTables.flatMap(r =>
      catalog.table(r).currentSnapshot.files.map(_.sizeBytes))
    if (sizes.isEmpty) 0.0 else 100.0 * sizes.count(_ < targetBytes) / sizes.size
  }
}
