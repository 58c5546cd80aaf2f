package repro.lst

import org.apache.spark.sql.functions._

import repro.Oracle

class LstWriterReaderSpec extends LstFixture {

  test("append to unpartitioned table hits the requested file count") {
    val c = freshCatalog()
    val t = loadedOrders(c, files = 6)
    val snap = t.currentSnapshot
    assert(snap.fileCount == 6)
    assert(snap.files.forall(_.partition.isEmpty))
    assert(snap.files.forall(_.recordCount > 0))
  }

  test("append to partitioned table tags files with partition values") {
    val c = freshCatalog()
    val t = loadedLineitem(c, months = 3, filesPerPartition = 3)
    val snap = t.currentSnapshot
    assert(snap.partitions.nonEmpty)
    assert(snap.files.forall(_.partition.isDefined))
    // ~3 files per month partition (salting is approximate but bounded)
    snap.files.groupBy(_.partition).foreach { case (_, fs) =>
      assert(fs.size >= 1 && fs.size <= 3)
    }
  }

  test("recordCount from footers matches source row count") {
    val c = freshCatalog()
    val df = tinyOrders(sf = 0.001)
    val expected = df.count()
    val t = c.createTable("db1", "o", None)
    LstWriter.append(spark, t, df, 4)
    assert(t.currentSnapshot.totalRecords == expected)
  }

  test("scan returns all appended data (oracle-checked)") {
    val c = freshCatalog()
    val df = tinyOrders(sf = 0.001)
    val t = c.createTable("db1", "o", None)
    LstWriter.append(spark, t, df, 5)
    val got = LstReader.scan(spark, t).df
      .agg(count(lit(1)) as "n", round(sum(col("o_totalprice")), 2) as "total")
    Oracle.assertEquivalent(got,
      "SELECT count(*) AS n, round(sum(CAST(o_totalprice AS DOUBLE)), 2) AS total FROM orders",
      "orders" -> df)
  }

  test("partitioned scan keeps source columns intact (oracle-checked)") {
    val c = freshCatalog()
    val df = tinyLineitem(sf = 0.001, months = 2)
    val t = c.createTable("db1", "li", Some("l_shipmonth"))
    LstWriter.append(spark, t, df, 3)
    val got = LstReader.scan(spark, t).df
      .groupBy(col("l_returnflag") as "rf")
      .agg(round(sum(col("l_extendedprice")), 2) as "revenue")
      .select(col("rf"), col("revenue"))
    Oracle.assertEquivalent(got,
      "SELECT l_returnflag AS rf, round(sum(CAST(l_extendedprice AS DOUBLE)), 2) AS revenue " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> df.drop("l_shipmonth"))
  }

  test("partition column dropped from physical files, rows partitioned correctly") {
    val c = freshCatalog()
    val t = loadedLineitem(c, months = 3)
    val snap = t.currentSnapshot
    val aFile = snap.files.head
    val content = spark.read.parquet(aFile.path)
    assert(!content.columns.contains("l_shipmonth"))
    // every row in the file belongs to the tagged month
    val months = content.select(date_format(col("l_shipdate"), "yyyy-MM")).distinct()
      .collect().map(_.getString(0)).toSet
    assert(months == Set(aFile.partition.get))
  }

  test("scan with partition filter only touches that partition's files") {
    val c = freshCatalog()
    val t = loadedLineitem(c, months = 3)
    val snap = t.currentSnapshot
    val p = snap.partitions.head
    val scan = LstReader.scan(spark, t, Some(p))
    assert(scan.filesScanned == snap.filesIn(Some(p)).size)
    assert(scan.bytesScanned == snap.filesIn(Some(p)).map(_.sizeBytes).sum)
  }

  test("scan of empty table returns typed empty DF after schema registration") {
    val c = freshCatalog()
    val t = c.createTable("db1", "o", None)
    // no schema yet → empty schema, zero files
    val s0 = LstReader.scan(spark, t)
    assert(s0.filesScanned == 0 && s0.df.columns.isEmpty)
    LstWriter.append(spark, t, tinyOrders(sf = 0.001), 2)
    // remove everything via overwrite, then scan: schema must survive
    val snap = t.currentSnapshot
    t.commit(snap.version, Overwrite(snap.files.map(_.path), Vector.empty))
    val s1 = LstReader.scan(spark, t)
    assert(s1.filesScanned == 0)
    assert(s1.df.columns.contains("o_orderkey"))
  }

  test("deleteFraction removes ~the requested fraction of rows") {
    val c = freshCatalog()
    val df = tinyOrders(sf = 0.002)
    val before = df.count()
    val t = c.createTable("db1", "o", None)
    LstWriter.append(spark, t, df, 5)
    val res = LstWriter.deleteFraction(spark, t, rowFraction = 0.3, partition = None, seed = 7)
    assert(res.succeeded && res.conflicts == 0)
    val after = LstReader.scan(spark, t).df.count()
    val removedFrac = 1.0 - after.toDouble / before
    assert(removedFrac > 0.15 && removedFrac < 0.45, s"removedFrac=$removedFrac")
  }

  test("deleteFraction scoped to a partition leaves other partitions untouched") {
    val c = freshCatalog()
    val t = loadedLineitem(c, sf = 0.002, months = 3)
    val snap0 = t.currentSnapshot
    val victim = snap0.partitions.head
    val others = snap0.partitions.tail
    LstWriter.deleteFraction(spark, t, 0.5, Some(victim), seed = 3)
    val snap1 = t.currentSnapshot
    others.foreach { p =>
      assert(snap1.filesIn(Some(p)).map(_.path) == snap0.filesIn(Some(p)).map(_.path))
    }
    assert(snap1.filesIn(Some(victim)).map(_.path) != snap0.filesIn(Some(victim)).map(_.path))
  }

  test("deleteFraction is deterministic in seed") {
    val c = freshCatalog()
    val t1 = c.createTable("db1", "o1", None)
    val t2 = c.createTable("db1", "o2", None)
    LstWriter.append(spark, t1, tinyOrders(sf = 0.001), 4)
    LstWriter.append(spark, t2, tinyOrders(sf = 0.001), 4)
    LstWriter.deleteFraction(spark, t1, 0.2, None, seed = 11)
    LstWriter.deleteFraction(spark, t2, 0.2, None, seed = 11)
    assert(LstReader.scan(spark, t1).df.count() == LstReader.scan(spark, t2).df.count())
  }

  test("deleteFraction retries through a conflict and succeeds") {
    val c = freshCatalog()
    val t = c.createTable("db1", "o", None)
    LstWriter.append(spark, t, tinyOrders(sf = 0.001), 4)
    // Sabotage: a racing overwrite lands between plan and commit. We emulate
    // by removing one file right before calling delete with a stale plan —
    // deleteFraction replans internally, so drive the race via a thread.
    val snap = t.currentSnapshot
    val racer = new Thread(() => {
      t.commit(snap.version, Overwrite(Vector(snap.files.head.path), Vector.empty))
    })
    racer.start(); racer.join()
    val res = LstWriter.deleteFraction(spark, t, 0.2, None, seed = 1)
    assert(res.succeeded)
  }

  test("appends accumulate files and bytes over multiple writes") {
    val c = freshCatalog()
    val t = c.createTable("db1", "o", None)
    val r1 = LstWriter.append(spark, t, tinyOrders(sf = 0.0005, seed = 1), 3)
    val r2 = LstWriter.append(spark, t, tinyOrders(sf = 0.0005, seed = 2), 3)
    assert(r1.addedFiles == 3 && r2.addedFiles == 3)
    assert(t.currentSnapshot.fileCount == 6)
    assert(t.currentVersion == 2)
  }

  test("stageForPartition drops empty output splits") {
    val c = freshCatalog()
    val t = c.createTable("db1", "o", None)
    val df = tinyOrders(sf = 0.0005).limit(3)
    // ask for far more files than rows: empty splits must be discarded
    val files = LstWriter.stageForPartition(spark, t, df, None, nFiles = 16, seed = 0, baseVersion = 0)
    assert(files.nonEmpty && files.size <= 3)
    assert(files.forall(_.recordCount > 0))
  }
}
