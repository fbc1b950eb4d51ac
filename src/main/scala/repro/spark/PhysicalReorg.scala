package repro.spark

import java.nio.file.{Files, Path, Paths}
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.TableSchema
import repro.layout.Layout
import scala.jdk.CollectionConverters._

/** Physical measurement harness for the reorganization-vs-query cost ratio α
  * (paper Table I). Reorganization includes the paper's four steps:
  * 1) reading partitions from disk, 2) updating the BID column,
  * 3) repartitioning the dataset by BID, 4) compressing and writing the new
  * Parquet partitions.
  */
object PhysicalReorg {

  /** Wall-clock seconds of `body` (forces evaluation via the returned unit). */
  def timed(body: => Unit): Double = {
    val t0 = System.nanoTime()
    body
    (System.nanoTime() - t0) / 1e9
  }

  /** Full-table-scan query time: an aggregate that must read every column
    * group of every file (sum over all numeric columns).
    */
  def timeFullScan(spark: SparkSession, path: String, schema: TableSchema): Double = timed {
    val df = spark.read.parquet(path)
    val aggs = schema.names.map(n => sum(col(n)).as(s"s_$n"))
    df.agg(aggs.head, aggs.tail: _*).collect()
  }

  /** Reorganization time: read → recompute BID under `newLayout` → shuffle by
    * BID → compress + write new Parquet partitions at `outPath`.
    */
  def timeReorg(spark: SparkSession, path: String, schema: TableSchema,
                newLayout: Layout, outPath: String): Double = timed {
    val df = spark.read.parquet(path).drop(BidTable.BidCol)
    BidTable.write(df, schema, newLayout, outPath)
  }

  /** Total size on disk of a Parquet table directory, in megabytes. */
  def dirSizeMb(path: String): Double = {
    val root = Paths.get(path)
    if (!Files.exists(root)) 0.0
    else {
      val stream = Files.walk(root)
      try {
        stream.iterator.asScala
          .filter(p => Files.isRegularFile(p))
          .map(p => Files.size(p))
          .sum / 1e6
      } finally stream.close()
    }
  }

  /** Recursively delete a directory (test/bench scratch space). */
  def deleteDir(path: String): Unit = {
    val root = Paths.get(path)
    if (Files.exists(root)) {
      val stream = Files.walk(root)
      val all: Seq[Path] = try stream.iterator.asScala.toSeq finally stream.close()
      all.sortBy(-_.getNameCount).foreach(Files.deleteIfExists(_))
    }
  }
}
