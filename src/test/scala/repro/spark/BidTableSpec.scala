package repro.spark

import java.nio.file.Files
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core._
import repro.data.TpchLite
import repro.layout.{QdTree, RangeLayout}
import scala.util.Random

/** End-to-end checks of the shallow Spark integration: BID materialization,
  * Parquet-partitioned storage, metadata-driven query rewriting — verified
  * for result equality against DuckDB running the *unrewritten* query.
  */
class BidTableSpec extends SparkSpec {

  private lazy val workDir = Files.createTempDirectory("bidtable").toString
  private val sf = 0.002
  private lazy val df = TpchLite.denorm(spark, sf).cache()
  private lazy val data = DataMatrix.collect(df, TpchLite.schema)

  private lazy val qdLayout = {
    val rng = new Random(1)
    val qs = Vector.tabulate(100)(i =>
      Query(i, i % 13, TpchLite.templates(i % 13).instantiate(rng)))
    QdTree.build(data.sample(1000, 2), qs, 8, "qd-test")
  }

  private lazy val qdPath = {
    val p = s"$workDir/qd"
    BidTable.write(df, TpchLite.schema, qdLayout, p)
    p
  }
  private lazy val qdMeta = MetadataBuilder.fromMatrix(data, qdLayout)

  test("write produces one directory per BID") {
    val dirs = new java.io.File(qdPath).listFiles().filter(_.isDirectory)
      .map(_.getName).filter(_.startsWith("BID="))
    assert(dirs.nonEmpty)
    assert(dirs.length == qdMeta.partitions.size)
  }

  test("written table preserves the row count") {
    assert(BidTable.read(spark, qdPath).count() == df.count())
  }

  test("BID column values match local routing metadata") {
    val table = BidTable.read(spark, qdPath)
    val counts = table.groupBy(BidTable.BidCol).count().collect()
      .map(r => r.getAs[Number](0).intValue() -> r.getLong(1)).toMap
    val expected = qdMeta.partitions.map(p => p.bid -> p.rowCount).toMap
    assert(counts == expected)
  }

  test("rewritten query equals DuckDB on the full, unfiltered table") {
    val rng = new Random(7)
    val table = BidTable.read(spark, qdPath)
    for (t <- Seq(0, 4, 5, 9, 12)) {
      val q = Query(0, t, TpchLite.templates(t).instantiate(rng))
      val sparkRes = BidTable.rewrite(table, q, qdMeta)
        .agg(count(lit(1)) as "cnt",
             round(sum(col("l_quantity")), 2) as "qty")
      Oracle.assertEquivalent(sparkRes,
        s"SELECT count(*) AS cnt, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        s"FROM t WHERE ${q.toSql}", "t" -> df)
    }
  }

  test("selective queries actually prune partitions") {
    val rng = new Random(3)
    var pruned = 0
    for (i <- 0 until 20) {
      val q = Query(i, 9, TpchLite.templates(9).instantiate(rng)) // q14: 30-day range
      if (BidTable.partitionsRead(q, qdMeta) < qdMeta.partitions.size) pruned += 1
    }
    assert(pruned > 10, s"expected pruning on most selective queries; got $pruned/20")
  }

  test("a query with an always-true predicate reads every partition") {
    val q = Query(0, 0, Seq(RangePred("l_quantity", -1e9, 1e9)))
    assert(BidTable.partitionsRead(q, qdMeta) == qdMeta.partitions.size)
    val cnt = BidTable.rewrite(BidTable.read(spark, qdPath), q, qdMeta).count()
    assert(cnt == df.count())
  }

  test("reorganization to a different layout preserves content") {
    val j = TpchLite.schema.indexOf("o_orderdate")
    val range = RangeLayout.equiDepth("by-date", "o_orderdate", data.cols(j), 8, TpchLite.schema)
    val outPath = s"$workDir/range"
    val secs = PhysicalReorg.timeReorg(spark, qdPath, TpchLite.schema, range, outPath)
    assert(secs > 0)
    val reorged = BidTable.read(spark, outPath)
    assert(reorged.count() == df.count())
    // content equality on a checksum aggregate
    val a = df.agg(round(sum(col("l_extendedprice")), 0)).collect()(0).getDouble(0)
    val b = reorged.agg(round(sum(col("l_extendedprice")), 0)).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("rewritten queries stay correct after reorganization") {
    val j = TpchLite.schema.indexOf("o_orderdate")
    val range = RangeLayout.equiDepth("by-date2", "o_orderdate", data.cols(j), 8, TpchLite.schema)
    val outPath = s"$workDir/range2"
    BidTable.write(df, TpchLite.schema, range, outPath)
    val meta = MetadataBuilder.fromMatrix(data, range)
    val rng = new Random(11)
    val q = Query(0, 2, TpchLite.templates(2).instantiate(rng)) // q4: orderdate range
    val sparkRes = BidTable.rewrite(BidTable.read(spark, outPath), q, meta)
      .agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(sparkRes,
      s"SELECT count(*) AS cnt FROM t WHERE ${q.toSql}", "t" -> df)
  }

  test("full scan timing is positive and repeatable") {
    val s1 = PhysicalReorg.timeFullScan(spark, qdPath, TpchLite.schema)
    val s2 = PhysicalReorg.timeFullScan(spark, qdPath, TpchLite.schema)
    assert(s1 > 0 && s2 > 0)
  }

  test("dirSizeMb sees the written files") {
    assert(PhysicalReorg.dirSizeMb(qdPath) > 0.01)
  }

  test("deleteDir removes scratch directories") {
    val p = s"$workDir/scratch"
    BidTable.write(df.limit(100), TpchLite.schema, qdLayout, p)
    assert(PhysicalReorg.dirSizeMb(p) > 0)
    PhysicalReorg.deleteDir(p)
    assert(PhysicalReorg.dirSizeMb(p) == 0.0)
  }
}
