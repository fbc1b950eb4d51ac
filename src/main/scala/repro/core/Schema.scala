package repro.core

import org.apache.spark.sql.DataFrame

/** Column of an encoded analytic table.
  *
  * All experiment tables are *encoded*: every column is a double. Dates are
  * days (or hours) since a fixed epoch and categorical strings are dictionary
  * codes. Partition-level min/max skipping is order-preserving, and
  * categorical skipping uses distinct-value sets, so the encoding preserves
  * the skipping behaviour of the original typed table (see DESIGN.md §3).
  *
  * @param name          column name (matches the DataFrame column)
  * @param isCategorical true for dictionary-coded columns; partition metadata
  *                      then keeps the distinct code set (domains are small)
  * @param cardinality   domain size for categorical columns (codes are
  *                      0 until cardinality); 0 for numeric columns
  */
final case class ColumnDef(name: String, isCategorical: Boolean = false, cardinality: Int = 0)

/** Ordered schema of an encoded table; provides name -> index resolution. */
final case class TableSchema(columns: IndexedSeq[ColumnDef]) {
  val names: IndexedSeq[String] = columns.map(_.name)
  private val byName: Map[String, Int] = names.zipWithIndex.toMap

  def size: Int = columns.size
  def indexOf(col: String): Int =
    byName.getOrElse(col, throw new IllegalArgumentException(s"unknown column $col in $names"))
  def apply(i: Int): ColumnDef = columns(i)
  def isCategorical(col: String): Boolean = columns(indexOf(col)).isCategorical
}

/** Column-major in-memory copy of (a sample of) an encoded table.
  *
  * Used by the layout generators (which the paper runs on a 0.1–1% data
  * sample) and by the simulation-mode metadata builder. Column-major layout
  * keeps the routing/aggregation loops cache-friendly.
  */
final case class DataMatrix(schema: TableSchema, cols: Array[Array[Double]]) {
  require(cols.length == schema.size, s"matrix has ${cols.length} columns, schema has ${schema.size}")
  val numRows: Int = if (cols.isEmpty) 0 else cols(0).length

  /** Accessor for row `i`: returns a colIdx -> value function used by layout routing. */
  def row(i: Int): Int => Double = j => cols(j)(i)

  /** Uniformly sample up to `n` rows (deterministic in `seed`). */
  def sample(n: Int, seed: Long): DataMatrix = {
    if (numRows <= n) this
    else {
      val rng = new scala.util.Random(seed)
      val idx = Array.fill(n)(rng.nextInt(numRows))
      DataMatrix(schema, cols.map(c => idx.map(c)))
    }
  }
}

object DataMatrix {
  /** Collect an encoded DataFrame (all-double columns, in schema order) to the driver. */
  def collect(df: DataFrame, schema: TableSchema): DataMatrix = {
    import org.apache.spark.sql.functions.col
    val rows = df.select(schema.names.map(n => col(n).cast("double")): _*).collect()
    val m = Array.ofDim[Double](schema.size, rows.length)
    var i = 0
    while (i < rows.length) {
      val r = rows(i)
      var j = 0
      while (j < schema.size) { m(j)(i) = r.getDouble(j); j += 1 }
      i += 1
    }
    DataMatrix(schema, m)
  }
}
