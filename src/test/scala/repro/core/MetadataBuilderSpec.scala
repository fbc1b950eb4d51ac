package repro.core

import repro.SparkSpec
import repro.layout.{QdTree, RangeLayout}
import scala.util.Random

class MetadataBuilderSpec extends SparkSpec {

  private val schema = TableSchema(IndexedSeq(
    ColumnDef("a"),
    ColumnDef("c", isCategorical = true, cardinality = 4),
  ))

  private def matrix(n: Int, seed: Long = 1): DataMatrix = {
    val rng = new Random(seed)
    DataMatrix(schema, Array(
      Array.fill(n)(math.floor(rng.nextDouble() * 1000) / 10),
      Array.fill(n)(rng.nextInt(4).toDouble),
    ))
  }

  private def toDf(m: DataMatrix) = {
    import spark.implicits._
    (0 until m.numRows).map(i => (m.cols(0)(i), m.cols(1)(i))).toDF("a", "c")
  }

  test("fromMatrix: row counts cover the dataset exactly") {
    val m = matrix(500)
    val l = RangeLayout("r", "a", 0, Array(25.0, 50.0, 75.0))
    val meta = MetadataBuilder.fromMatrix(m, l)
    assert(meta.totalRows == 500)
  }

  test("fromMatrix: min/max are exact per partition") {
    val m = DataMatrix(schema, Array(Array(1.0, 5.0, 30.0, 99.0), Array(0.0, 1.0, 2.0, 3.0)))
    val l = RangeLayout("r", "a", 0, Array(20.0))
    val meta = MetadataBuilder.fromMatrix(m, l)
    val p0 = meta.partitions.find(_.bid == 0).get
    assert(p0.cols("a").min == 1.0 && p0.cols("a").max == 5.0)
    val p1 = meta.partitions.find(_.bid == 1).get
    assert(p1.cols("a").min == 30.0 && p1.cols("a").max == 99.0)
  }

  test("fromMatrix: distinct sets kept only for categorical columns") {
    val m = matrix(200)
    val l = RangeLayout("r", "a", 0, Array(50.0))
    val meta = MetadataBuilder.fromMatrix(m, l)
    for (p <- meta.partitions) {
      assert(p.cols("a").distinct.isEmpty)
      assert(p.cols("c").distinct.nonEmpty)
      assert(p.cols("c").distinct.get.subsetOf(Set(0.0, 1.0, 2.0, 3.0)))
    }
  }

  test("fromMatrix: empty partitions are dropped") {
    val m = DataMatrix(schema, Array(Array(1.0, 2.0), Array(0.0, 1.0)))
    val l = RangeLayout("r", "a", 0, Array(100.0, 200.0)) // partitions 1,2 empty
    val meta = MetadataBuilder.fromMatrix(m, l)
    assert(meta.partitions.map(_.bid) == IndexedSeq(0))
  }

  test("fromMatrix: routing outside [0,k) is rejected") {
    val m = DataMatrix(schema, Array(Array(1.0), Array(0.0)))
    val bad = new repro.layout.Layout {
      val id = "bad"; val kind = "bad"; val numPartitions = 2
      def bidOf(get: Int => Double): Int = 7
      def bidColumn(s: TableSchema) = org.apache.spark.sql.functions.lit(7)
    }
    assertThrows[IllegalArgumentException](MetadataBuilder.fromMatrix(m, bad))
  }

  test("fromDataFrame matches fromMatrix on identical data (range layout)") {
    val m = matrix(400, seed = 3)
    val l = RangeLayout("r", "a", 0, Array(25.0, 50.0, 75.0))
    val local = MetadataBuilder.fromMatrix(m, l)
    val viaSpark = MetadataBuilder.fromDataFrame(toDf(m), schema, l)
    assert(viaSpark.partitions == local.partitions)
  }

  test("fromDataFrame matches fromMatrix on a qd-tree layout") {
    val m = matrix(600, seed = 4)
    val qs = (0 until 20).map(i => Query(i, 0, Seq(RangePred("a", i * 5.0, i * 5.0 + 4))))
    val t = QdTree.build(m, qs, 8, "t")
    val local = MetadataBuilder.fromMatrix(m, t)
    val viaSpark = MetadataBuilder.fromDataFrame(toDf(m), schema, t)
    assert(viaSpark.partitions == local.partitions)
  }

  test("skipping is conservative: skipped partitions contain no matching rows") {
    val m = matrix(1000, seed = 6)
    val qs = (0 until 15).map(i => Query(i, 0, Seq(
      RangePred("a", i * 6.0, i * 6.0 + 8), InPred("c", Set((i % 4).toDouble)))))
    val t = QdTree.build(m, qs, 8, "t")
    val meta = MetadataBuilder.fromMatrix(m, t)
    for (q <- qs) {
      val needed = meta.partitionsNeeded(q).toSet
      for (i <- 0 until m.numRows if q.matchesRow(schema, m.row(i))) {
        assert(needed.contains(t.bidOf(m.row(i))),
          s"row $i matches $q but its partition was skipped")
      }
    }
  }

  test("fractionAccessed is within [0,1] for arbitrary queries (property)") {
    val m = matrix(500, seed = 8)
    val l = RangeLayout("r", "a", 0, Array(30.0, 60.0))
    val meta = MetadataBuilder.fromMatrix(m, l)
    val rng = new Random(2)
    for (_ <- 1 to 500) {
      val lo = rng.nextDouble() * 120 - 10
      val q = Query(0, 0, Seq(RangePred("a", lo, lo + rng.nextDouble() * 50)))
      val f = meta.fractionAccessed(q)
      assert(f >= 0.0 && f <= 1.0)
    }
  }

  test("fraction accessed upper-bounds the true matching fraction") {
    val m = matrix(800, seed = 9)
    val l = RangeLayout("r", "a", 0, Array(20.0, 40.0, 60.0, 80.0))
    val meta = MetadataBuilder.fromMatrix(m, l)
    val rng = new Random(3)
    for (_ <- 1 to 100) {
      val lo = rng.nextDouble() * 100
      val q = Query(0, 0, Seq(RangePred("a", lo, lo + 10)))
      val trueFrac = (0 until m.numRows).count(i => q.matchesRow(schema, m.row(i))).toDouble / m.numRows
      assert(meta.fractionAccessed(q) >= trueFrac - 1e-12)
    }
  }
}
