package repro.core

import repro.layout.Layout

/** An MTS state: a layout plus the partition-level metadata OREO uses to
  * estimate its query costs without touching the data.
  */
final case class LayoutState(layout: Layout, metadata: LayoutMetadata) {
  def id: String = layout.id

  /** Service cost c(s, q): fraction of data records accessed. */
  def cost(q: Query): Double = metadata.fractionAccessed(q)
}
