package repro.core

import repro.workload.Workload
import scala.collection.mutable

/** A candidate layout emitted by the layout generator after query `atQuery`
  * has been serviced (its generation window includes that query).
  */
final case class Candidate(atQuery: Int, state: LayoutState)

/** Result of one simulated run.
  *
  * @param queryCost  Σ c(effective layout, q) — fraction-of-data units
  * @param reorgCost  α × number of switch decisions
  * @param switches   number of switch decisions
  * @param cumulative total cost sampled every `cumEvery` queries (Fig 4)
  */
final case class SimResult(name: String, queryCost: Double, reorgCost: Double,
                           switches: Int, cumulative: Vector[Double]) {
  def totalCost: Double = queryCost + reorgCost
}

/** Replays a query stream against a [[Strategy]], accounting query cost on
  * the *effective* layout (decisions take effect Δ+1 queries after they are
  * made — the paper's background-reorganization delay model, §VI-D5: "the
  * cost of the reorganization is incurred as soon as the decision is made"
  * but "longer delays lead to increased query costs").
  */
object Simulator {

  def run(workload: Workload, initial: LayoutState, candidates: Seq[Candidate],
          strategy: Strategy, alpha: Double, delay: Int = 0,
          cumEvery: Int = 100): SimResult = {
    val candQueue = mutable.Queue(candidates.sortBy(_.atQuery): _*)
    val pending = mutable.Queue.empty[(Int, LayoutState)] // (applyAt, layout)
    var effective = initial
    var queryCost = 0.0
    var reorgCost = 0.0
    var switches = 0
    val cumulative = Vector.newBuilder[Double]

    def decide(i: Int, d: Option[LayoutState]): Unit = d.foreach { next =>
      switches += 1
      reorgCost += alpha
      pending.enqueue((i + 1 + delay, next))
    }

    for ((q, i) <- workload.queries.zipWithIndex) {
      while (pending.nonEmpty && pending.head._1 <= i) effective = pending.dequeue()._2
      queryCost += effective.cost(q)
      decide(i, strategy.observe(q))
      while (candQueue.nonEmpty && candQueue.head.atQuery <= i) {
        decide(i, strategy.onCandidate(candQueue.dequeue().state))
      }
      if ((i + 1) % cumEvery == 0) cumulative += queryCost + reorgCost
    }
    SimResult(strategy.name, queryCost, reorgCost, switches, cumulative.result())
  }

  /** Offline-Optimal oracle (§VI-C): sees the whole workload, switches to the
    * segment's best layout exactly at each template change (no delay, no
    * regret) — the lower bound used in Figure 4.
    *
    * @param bestOf best precomputed layout per template id
    */
  def offlineOptimal(workload: Workload, initial: LayoutState,
                     bestOf: Map[Int, LayoutState], alpha: Double,
                     cumEvery: Int = 100): SimResult = {
    var cur = initial
    var queryCost = 0.0
    var reorgCost = 0.0
    var switches = 0
    val cumulative = Vector.newBuilder[Double]
    val segStarts = workload.segmentStarts.zip(workload.segmentTemplates).toMap
    for ((q, i) <- workload.queries.zipWithIndex) {
      segStarts.get(i).foreach { t =>
        val best = bestOf.getOrElse(t, cur)
        if (best.id != cur.id) { cur = best; switches += 1; reorgCost += alpha }
      }
      queryCost += cur.cost(q)
      if ((i + 1) % cumEvery == 0) cumulative += queryCost + reorgCost
    }
    SimResult("Offline Optimal", queryCost, reorgCost, switches, cumulative.result())
  }
}
