package repro.workload

import repro.core.{Predicate, Query}
import scala.util.Random

/** A parameterized query template: draws a fresh conjunction of predicates
  * each time it is instantiated (e.g., TPC-H q6 with random date/discount).
  */
final case class QueryTemplate(name: String)(gen: Random => Seq[Predicate]) {
  def instantiate(rng: Random): Seq[Predicate] = gen(rng)
}

/** A generated query stream plus its segment structure (used only by the
  * Offline-Optimal oracle, which knows template-switch points).
  */
final case class Workload(queries: Vector[Query],
                          segmentStarts: Vector[Int],
                          segmentTemplates: Vector[Int]) {
  def size: Int = queries.size
  def templates: Set[Int] = segmentTemplates.toSet
}

/** The paper's workload generator (§VI-A2): "behaves like a state machine and
  * samples queries from one query template for an arbitrary amount of time
  * before switching to another random query template" — e.g., 30,000 queries
  * over 20 segments for TPC-H/TPC-DS.
  */
object WorkloadGen {

  /** Generate a stream of `nQueries` queries in `nSegments` random-length
    * segments; each segment uses one template drawn uniformly (never the
    * same as the previous segment). Deterministic in `seed`.
    */
  def generate(templates: IndexedSeq[QueryTemplate], nQueries: Int,
               nSegments: Int, seed: Long): Workload = {
    require(templates.nonEmpty && nQueries >= nSegments && nSegments >= 1)
    val rng = new Random(seed)

    // random segment lengths: smoothed weights avoid degenerate tiny segments
    val weights = Vector.fill(nSegments)(0.25 + rng.nextDouble())
    val total = weights.sum
    val rawLens = weights.map(w => math.max(1, (w / total * nQueries).toInt))
    val lens = {
      val diff = nQueries - rawLens.sum
      rawLens.updated(0, rawLens.head + diff) // absorb rounding in segment 0
    }

    // template per segment, no immediate repeats (if more than one template)
    val segTemplates = lens.indices.foldLeft(Vector.empty[Int]) { (acc, _) =>
      val t = Iterator.continually(rng.nextInt(templates.size))
        .dropWhile(c => templates.size > 1 && acc.lastOption.contains(c)).next()
      acc :+ t
    }

    val queries = Vector.newBuilder[Query]
    var qid = 0
    val starts = Vector.newBuilder[Int]
    for ((len, seg) <- lens.zipWithIndex) {
      starts += qid
      val t = segTemplates(seg)
      for (_ <- 0 until len) {
        queries += Query(qid, t, templates(t).instantiate(rng))
        qid += 1
      }
    }
    Workload(queries.result(), starts.result(), segTemplates)
  }
}
