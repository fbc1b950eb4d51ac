package repro.core

import repro.layout.{Layout, LayoutGen}
import repro.workload.Workload
import scala.collection.mutable
import scala.util.Random

/** Precomputes the candidate layouts the LAYOUT MANAGER would generate over
  * a query stream. The three online strategies (Greedy, Regret, OREO) share
  * the same candidate set (§VI-A3: "utilize the same set of data layout
  * candidates computed periodically based on a sliding window of recent
  * queries"), so candidates are computed once per (workload, source) and
  * replayed into every strategy run — including the 3-seed MTS averages.
  */
object CandidateStream {

  /** Workload-sampling source for candidate generation (§VI-D4). */
  sealed trait Source { def tag: String }
  /** Sliding window of recent queries (the paper's default). */
  case object SW extends Source { val tag = "sw" }
  /** Time-biased reservoir sample. */
  case object RS extends Source { val tag = "rs" }
  /** Union: at each epoch, one candidate from each source. */
  case object SWRS extends Source { val tag = "swrs" }

  /** @param windowSize sliding window length (paper default: 200)
    * @param every      generate a candidate every `every` queries
    * @param k          target partitions per layout
    * @param sampleRows data-sample size for layout construction
    * @param rsCapacity reservoir capacity for the RS source
    * @param rsLambda   reservoir time-decay rate
    */
  final case class GenConfig(windowSize: Int = 200, every: Int = 200, k: Int = 32,
                             sampleRows: Int = 1000, rsCapacity: Int = 200,
                             rsLambda: Double = 2e-4, seed: Long = 13)

  /** Run the generation schedule over the workload and materialize each
    * candidate's partition metadata against `data` (a driver-local matrix of
    * the dataset — see DESIGN.md §2 on simulation-mode metadata).
    */
  def compute(workload: Workload, data: DataMatrix, gen: LayoutGen,
              source: Source, cfg: GenConfig = GenConfig()): Vector[Candidate] = {
    val buildSample = data.sample(cfg.sampleRows, cfg.seed)
    val window = mutable.Queue.empty[Query]
    val reservoir = new Rtbs[Query](cfg.rsCapacity, cfg.rsLambda, new Random(cfg.seed + 1))
    val out = Vector.newBuilder[Candidate]
    var epoch = 0

    def emit(atQuery: Int, qs: Seq[Query], tag: String): Unit = if (qs.nonEmpty) {
      val id = s"${gen.name}-$tag-$epoch"
      val layout = gen.generate(buildSample, qs, cfg.k, id)
      out += Candidate(atQuery, LayoutState(layout, MetadataBuilder.fromMatrix(data, layout)))
    }

    for ((q, i) <- workload.queries.zipWithIndex) {
      window.enqueue(q)
      if (window.size > cfg.windowSize) window.dequeue()
      reservoir.add(q)
      if ((i + 1) % cfg.every == 0) {
        epoch += 1
        source match {
          case SW   => emit(i, window.toSeq, "sw")
          case RS   => emit(i, reservoir.sample, "rs")
          case SWRS => emit(i, window.toSeq, "sw"); emit(i, reservoir.sample, "rs")
        }
      }
    }
    out.result()
  }

  /** Build a [[LayoutState]] from a concrete layout and the dataset matrix. */
  def state(layout: Layout, data: DataMatrix): LayoutState =
    LayoutState(layout, MetadataBuilder.fromMatrix(data, layout))
}
