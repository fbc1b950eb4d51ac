package repro.data

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions.{datediff, lit, when}

/** Helpers for producing *encoded* experiment tables (all columns double).
  *
  * Dates become day offsets from a fixed epoch and categorical strings become
  * dictionary codes — see DESIGN.md §3 for why this preserves data-skipping
  * behaviour (min/max pruning is order-invariant; categorical pruning uses
  * distinct-code sets, not ranges).
  */
object Encoding {

  /** Dictionary-encode a small string domain into codes 0..n-1 (when-chain). */
  def cat(c: Column, domain: Seq[String]): Column =
    domain.zipWithIndex.tail.foldLeft(when(c === domain.head, 0.0)) {
      case (acc, (v, i)) => acc.when(c === v, i.toDouble)
    }.otherwise(-1.0)

  /** Days since `epoch` (yyyy-MM-dd) as a double. */
  def days(c: Column, epoch: String): Column =
    datediff(c, lit(epoch).cast("date")).cast("double")
}
