package repro.lst

import java.nio.file.{Files, Path}

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.{SparkSpec, SynthData}

/** Shared helpers for LST-layer tests: fresh temp catalogs and tiny
  * deterministic TPC-H-lite tables.
  */
trait LstFixture extends SparkSpec {

  def freshCatalog(): LstCatalog =
    new LstCatalog(Files.createTempDirectory("lst-cat-"))

  def freshTableDir(): Path = Files.createTempDirectory("lst-tbl-")

  /** Tiny lineitem with monthly partition column (SF picks ~600 rows/0.0001). */
  def tinyLineitem(sf: Double = 0.001, months: Int = 3, seed: Long = 0): DataFrame =
    SynthData.lineitemMonthly(spark, sf, months, seed)

  def tinyOrders(sf: Double = 0.001, seed: Long = 1): DataFrame =
    SynthData.orders(spark, sf, seed)

  /** Create a partitioned lineitem LST table and load it with `files` files
    * per partition.
    */
  def loadedLineitem(cat: LstCatalog, db: String = "db1", name: String = "lineitem",
                     sf: Double = 0.001, months: Int = 3, filesPerPartition: Int = 4,
                     seed: Long = 0): LstTable = {
    val t = cat.createTable(db, name, Some("l_shipmonth"), nowMs = 1000L)
    LstWriter.append(spark, t, tinyLineitem(sf, months, seed), filesPerPartition, seed)
    t
  }

  /** Create an unpartitioned orders LST table with `files` files. */
  def loadedOrders(cat: LstCatalog, db: String = "db1", name: String = "orders",
                   sf: Double = 0.001, files: Int = 6, seed: Long = 1): LstTable = {
    val t = cat.createTable(db, name, None, nowMs = 1000L)
    LstWriter.append(spark, t, tinyOrders(sf, seed), files, seed)
    t
  }

  /** Sum of a numeric column via the LST read path (order-insensitive probe
    * for data equality).
    */
  def probeSum(table: LstTable, colName: String): Double = {
    val scan = LstReader.scan(spark, table)
    if (scan.filesScanned == 0) 0.0
    else scan.df.agg(sum(col(colName))).collect()(0).getDouble(0)
  }
}
