package repro.core

import org.apache.spark.sql.{DataFrame, functions => F}
import repro.layout.Layout
import scala.collection.mutable

/** Builds [[LayoutMetadata]] (per-partition row counts, min/max, categorical
  * distinct sets) for a layout over a dataset.
  *
  * Two modes:
  *  - `fromDataFrame` — exact, via a Spark `groupBy(BID)` aggregation; used
  *    by the physical Parquet path and by correctness tests.
  *  - `fromMatrix` — driver-local over an in-memory (sample) matrix; used by
  *    the simulation so that exploring hundreds of candidate layouts stays
  *    cheap (the paper likewise estimates costs from metadata, not data).
  * The two are cross-checked on identical inputs in the test suite.
  */
object MetadataBuilder {

  /** Domains up to this size keep distinct-value sets in the metadata. */
  val MaxDistinct = 64

  def fromDataFrame(df: DataFrame, schema: TableSchema, layout: Layout): LayoutMetadata = {
    val withBid = df.withColumn("__bid", layout.bidColumn(schema))
    val aggs = schema.columns.flatMap { c =>
      val base = Seq(F.min(c.name).as(s"min_${c.name}"), F.max(c.name).as(s"max_${c.name}"))
      if (c.isCategorical && c.cardinality <= MaxDistinct)
        base :+ F.collect_set(c.name).as(s"set_${c.name}")
      else base
    }
    val rows = withBid.groupBy("__bid")
      .agg(F.count(F.lit(1)).as("__cnt"), aggs: _*)
      .collect()
    val parts = rows.map { r =>
      val bid = r.getAs[Number]("__bid").intValue()
      val cnt = r.getAs[Long]("__cnt")
      val cols = schema.columns.map { c =>
        val mn = r.getAs[Number](s"min_${c.name}").doubleValue()
        val mx = r.getAs[Number](s"max_${c.name}").doubleValue()
        val set =
          if (c.isCategorical && c.cardinality <= MaxDistinct)
            Some(r.getAs[scala.collection.Seq[Any]](s"set_${c.name}")
              .map(v => v.asInstanceOf[Number].doubleValue()).toSet)
          else None
        c.name -> ColumnStats(mn, mx, set)
      }.toMap
      PartitionStats(bid, cnt, cols)
    }
    LayoutMetadata(parts.sortBy(_.bid).toIndexedSeq)
  }

  def fromMatrix(m: DataMatrix, layout: Layout): LayoutMetadata = {
    val k = layout.numPartitions
    val nCols = m.schema.size
    val counts = new Array[Long](k)
    val mins = Array.fill(nCols, k)(Double.PositiveInfinity)
    val maxs = Array.fill(nCols, k)(Double.NegativeInfinity)
    val keepSet = m.schema.columns.map(c => c.isCategorical && c.cardinality <= MaxDistinct).toArray
    val sets = Array.tabulate(nCols, k) { (j, _) =>
      if (keepSet(j)) mutable.Set.empty[Double] else null
    }
    var i = 0
    while (i < m.numRows) {
      val get = m.row(i)
      val bid = layout.bidOf(get)
      require(bid >= 0 && bid < k, s"layout ${layout.id} routed row to BID $bid outside [0,$k)")
      counts(bid) += 1
      var j = 0
      while (j < nCols) {
        val v = m.cols(j)(i)
        if (v < mins(j)(bid)) mins(j)(bid) = v
        if (v > maxs(j)(bid)) maxs(j)(bid) = v
        if (keepSet(j)) sets(j)(bid) += v
        j += 1
      }
      i += 1
    }
    val parts = (0 until k).filter(counts(_) > 0).map { bid =>
      val cols = m.schema.columns.zipWithIndex.map { case (c, j) =>
        c.name -> ColumnStats(mins(j)(bid), maxs(j)(bid),
          if (keepSet(j)) Some(sets(j)(bid).toSet) else None)
      }.toMap
      PartitionStats(bid, counts(bid), cols)
    }
    LayoutMetadata(parts.toIndexedSeq)
  }
}
