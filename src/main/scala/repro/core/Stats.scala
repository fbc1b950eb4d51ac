package repro.core

/** Per-partition statistics for one column.
  *
  * @param min      minimum encoded value in the partition
  * @param max      maximum encoded value in the partition
  * @param distinct distinct encoded values, kept only for categorical
  *                 columns with small domains (paper §VI-A1: "range of
  *                 values (or distinct values for categorical columns)")
  */
final case class ColumnStats(min: Double, max: Double, distinct: Option[Set[Double]]) {
  /** Conservative test: can a partition with these stats be skipped for `p`?
    * Returns true only if provably no row in the partition satisfies `p`.
    */
  def canSkip(p: Predicate): Boolean = p match {
    case RangePred(_, lo, hi) =>
      hi < min || lo > max || distinct.exists(d => !d.exists(v => v >= lo && v <= hi))
    case InPred(_, values) =>
      distinct match {
        case Some(d) => d.intersect(values).isEmpty
        case None    => values.forall(v => v < min || v > max)
      }
  }
}

/** Statistics for one partition (one BID) of a layout. */
final case class PartitionStats(bid: Int, rowCount: Long, cols: Map[String, ColumnStats])

/** Partition-level metadata for a whole layout — everything OREO needs to
  * estimate query costs without touching the data (`eval_skipped` in §III-B).
  */
final case class LayoutMetadata(partitions: IndexedSeq[PartitionStats]) {
  val totalRows: Long = partitions.map(_.rowCount).sum

  /** Can partition `p` be skipped for query `q`? (any disjoint predicate suffices) */
  def canSkip(p: PartitionStats, q: Query): Boolean =
    q.preds.exists(pred => p.cols.get(pred.colName).exists(_.canSkip(pred)))

  /** BIDs of partitions the query must read (the `BID IN (...)` list). */
  def partitionsNeeded(q: Query): Seq[Int] =
    partitions.filterNot(canSkip(_, q)).map(_.bid)

  /** Fraction of data records accessed by `q` — the service cost c(s,q) ∈ [0,1]. */
  def fractionAccessed(q: Query): Double =
    if (totalRows == 0) 0.0
    else partitions.iterator.filterNot(canSkip(_, q)).map(_.rowCount).sum.toDouble / totalRows

  /** Fraction of *partitions* skipped (diagnostic; the paper reports data skipped). */
  def fractionPartitionsSkipped(q: Query): Double =
    if (partitions.isEmpty) 0.0
    else partitions.count(canSkip(_, q)).toDouble / partitions.size
}
