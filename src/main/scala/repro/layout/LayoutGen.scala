package repro.layout

import repro.core.{DataMatrix, Query}

/** A pluggable layout generation mechanism (`generate_layout` in §III-B).
  * OREO is agnostic to the technique; the paper evaluates Qd-tree and
  * workload-aware Z-ordering.
  */
trait LayoutGen {
  def name: String
  def generate(sample: DataMatrix, queries: Seq[Query], k: Int, id: String): Layout
}

/** Qd-tree generation (greedy, basic cuts). */
object QdTreeGen extends LayoutGen {
  override val name = "qdtree"
  override def generate(sample: DataMatrix, queries: Seq[Query], k: Int, id: String): Layout =
    QdTree.build(sample, queries, k, id)
}

/** Workload-aware Z-ordering on the top-3 most-queried columns. */
object ZOrderGen extends LayoutGen {
  override val name = "zorder"
  override def generate(sample: DataMatrix, queries: Seq[Query], k: Int, id: String): Layout =
    ZOrder.build(sample, queries, k, id)
}
