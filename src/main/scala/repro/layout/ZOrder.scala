package repro.layout

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions.{col, udf}
import repro.core.{DataMatrix, Query, TableSchema}
import scala.collection.mutable

/** Workload-aware Z-order layout (paper §VI-A1): the dataset is split into
  * equal-sized partitions along the Z-order (Morton) curve over the top-3
  * most-queried columns of the recent window.
  *
  * Each column is quantile-bucketed into `2^bitsPerCol` buckets (bounds from
  * the data sample); the bucket indices are bit-interleaved into a Z-value,
  * and partition boundaries are equi-depth quantiles of the sample Z-values.
  *
  * @param colIdxs      schema indices of the Z-order columns (<= 3)
  * @param colNames     their names
  * @param bucketBounds per column: ascending inner bucket bounds (2^b - 1)
  * @param zBounds      ascending inner partition bounds over Z-values
  */
final case class ZOrderLayout(id: String, colIdxs: IndexedSeq[Int], colNames: IndexedSeq[String],
                              bucketBounds: IndexedSeq[Array[Double]],
                              zBounds: Array[Long]) extends Layout {
  override def kind: String = "zorder"
  override def numPartitions: Int = zBounds.length + 1

  private def bucket(bounds: Array[Double], v: Double): Int = {
    var lo = 0; var hi = bounds.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (v < bounds(mid)) hi = mid else lo = mid + 1
    }
    lo
  }

  /** Interleave the bucket bits of each column into the Morton code. */
  def zValue(values: IndexedSeq[Double]): Long = {
    val nCols = colIdxs.length
    val bits = bucketBounds.map(b => 64 - java.lang.Long.numberOfLeadingZeros(b.length.toLong))
    val maxBits = if (bits.isEmpty) 0 else bits.max.toInt
    val bks = Array.tabulate(nCols)(c => bucket(bucketBounds(c), values(c)))
    var z = 0L
    var bit = 0
    while (bit < maxBits) {
      var c = 0
      while (c < nCols) {
        z = (z << 1) | ((bks(c) >> (maxBits - 1 - bit)) & 1L)
        c += 1
      }
      bit += 1
    }
    z
  }

  def bidOfZ(z: Long): Int = {
    var lo = 0; var hi = zBounds.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (z < zBounds(mid)) hi = mid else lo = mid + 1
    }
    lo
  }

  override def bidOf(get: Int => Double): Int = bidOfZ(zValue(colIdxs.map(get)))

  override def bidColumn(schema: TableSchema): Column = {
    // Routing needs bucket binary-search + bit interleave — a deterministic
    // scalar UDF over the <=3 Z columns (only used to materialize BID writes,
    // never in query plans, so no pushdown is lost).
    val self = this
    val f = udf((a: Double, b: Double, c: Double) => {
      val vals = IndexedSeq(a, b, c).take(self.colIdxs.length)
      self.bidOfZ(self.zValue(vals))
    })
    val cs = colNames.map(col) ++ Seq.fill(3 - colNames.length)(col(colNames.head))
    f(cs(0), cs(1), cs(2))
  }
}

object ZOrder {

  /** Columns most frequently referenced by predicates in `queries` (top `n`). */
  def topQueriedColumns(queries: Seq[Query], n: Int): Seq[String] = {
    val freq = mutable.Map.empty[String, Int]
    for (q <- queries; p <- q.preds) freq(p.colName) = freq.getOrElse(p.colName, 0) + 1
    freq.toSeq.sortBy { case (c, f) => (-f, c) }.take(n).map(_._1)
  }

  /** Build a Z-order layout over the top-3 queried columns in the workload.
    *
    * @param sample     data sample for quantile bounds
    * @param queries    recent workload (drives the column choice)
    * @param k          target number of partitions
    * @param bitsPerCol bucket resolution per column (2^bits buckets)
    */
  def build(sample: DataMatrix, queries: Seq[Query], k: Int, id: String,
            bitsPerCol: Int = 4): ZOrderLayout = {
    val schema = sample.schema
    val names = topQueriedColumns(queries, 3) match {
      case Nil => schema.names.take(3)           // no predicates — arbitrary fallback
      case cs  => cs
    }
    val idxs = names.map(schema.indexOf).toIndexedSeq
    val nBuckets = 1 << bitsPerCol
    val bounds = idxs.map { j =>
      val sorted = sample.cols(j).sorted
      (1 until nBuckets).map { i =>
        sorted(math.min(sorted.length - 1, (i.toLong * sorted.length / nBuckets).toInt))
      }.distinct.toArray
    }
    // provisional layout (no partition bounds yet) to compute sample Z-values
    val proto = ZOrderLayout(id, idxs, names.toIndexedSeq, bounds, Array.empty)
    val zs = Array.tabulate(sample.numRows)(i => proto.zValue(idxs.map(j => sample.cols(j)(i)))).sorted
    val zBounds = (1 until k).map { i =>
      zs(math.min(zs.length - 1, (i.toLong * zs.length / k).toInt))
    }.distinct.toArray
    proto.copy(zBounds = zBounds)
  }
}
