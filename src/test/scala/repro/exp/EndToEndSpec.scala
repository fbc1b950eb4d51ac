package repro.exp

import repro.SparkSpec
import repro.core.CandidateStream.{GenConfig, SW}
import repro.core._
import repro.layout.QdTreeGen
import scala.util.Random

/** Integration test: the full OREO pipeline (data → workload → candidate
  * generation → strategies → simulation) at small scale, checking the
  * paper's qualitative findings.
  */
class EndToEndSpec extends SparkSpec {

  private val ds = Datasets.tpch
  private val sf = 0.005
  private val alpha = 40.0 // scaled with the shorter stream
  private val k = 16

  // Cadence scaled down with the stream (window/epoch 100 instead of 200):
  // at 2000 queries the segment length (~250) must stay a few multiples of
  // the candidate-generation lag for the dynamics to be visible at all.
  private lazy val data = Lab.matrix(spark, ds, sf)
  private lazy val workload = ds.mkWorkload(2000, 8, 42)
  private lazy val default = Lab.defaultState(data, ds, k)
  private lazy val candidates =
    CandidateStream.compute(workload, data, QdTreeGen, SW,
      GenConfig(windowSize = 100, every = 100, k = k))
  private lazy val static = Lab.staticState(data, workload, QdTreeGen, k)

  private lazy val staticRes =
    Simulator.run(workload, static, Nil, new StaticStrategy(static), alpha)
  private lazy val defaultRes =
    Simulator.run(workload, default, Nil, new StaticStrategy(default), alpha)
  private lazy val greedyRes =
    Simulator.run(workload, default, candidates, new GreedyStrategy(default), alpha)
  private lazy val regretRes =
    Simulator.run(workload, default, candidates, new RegretStrategy(default, alpha), alpha)
  private lazy val oreoRes =
    Lab.oreoAvg(workload, default, candidates, alpha, 1.0, 0.08, 0)

  test("candidate generation produces one layout per epoch") {
    assert(candidates.size == 2000 / 100)
    assert(candidates.map(_.state.id).distinct.size == candidates.size)
  }

  test("candidate layouts have valid metadata") {
    for (c <- candidates) {
      assert(c.state.metadata.totalRows == data.numRows)
      assert(c.state.metadata.partitions.nonEmpty)
    }
  }

  test("all strategies produce sane costs") {
    for (r <- Seq(staticRes, defaultRes, greedyRes, regretRes, oreoRes)) {
      assert(r.queryCost > 0 && r.queryCost <= workload.size.toDouble, r.name)
      assert(r.reorgCost >= 0, r.name)
    }
  }

  test("oreo reorganizes on a drifting workload") {
    assert(oreoRes.switches > 0)
  }

  test("a workload-aware static layout beats the default layout") {
    assert(staticRes.queryCost < defaultRes.queryCost)
  }

  test("oreo beats staying on the default layout") {
    assert(oreoRes.totalCost < defaultRes.totalCost)
  }

  test("oreo is in the static layout's cost range at miniature scale") {
    // At 2000 queries the fixed per-drift adaptation lag (candidate cadence
    // + phase deferral) is a large fraction of each segment, so OREO cannot
    // yet beat Static here — the paper's headline win is a full-length-
    // stream property, asserted in bench/Figure3Bench. This guards against
    // gross regressions only.
    assert(oreoRes.totalCost < staticRes.totalCost * 2.0,
      s"oreo=${oreoRes.totalCost} static=${staticRes.totalCost}")
  }

  test("greedy reorganizes at least as often as regret") {
    assert(greedyRes.switches >= regretRes.switches,
      s"greedy=${greedyRes.switches} regret=${regretRes.switches}")
  }

  test("greedy attains the lowest query cost among shared-candidate strategies") {
    val slack = 1.15
    assert(greedyRes.queryCost <= oreoRes.queryCost * slack)
    assert(greedyRes.queryCost <= regretRes.queryCost * slack)
  }

  test("oreo total cost is within the online field") {
    // loose sanity margin only: at 2000 queries the MTS exploration overhead
    // is amortized over too few queries; FullScaleSmokeSpec asserts OREO is
    // the best online strategy at the paper's stream length
    val best = Seq(greedyRes, regretRes).map(_.totalCost).min
    assert(oreoRes.totalCost <= best * 1.5,
      s"oreo=${oreoRes.totalCost} bestOther=$best")
  }

  test("offline optimal lower-bounds every strategy's query cost") {
    val best = Lab.templateBest(data, ds, QdTreeGen, k)
    val off = Simulator.offlineOptimal(workload, default, best, alpha)
    for (r <- Seq(greedyRes, oreoRes))
      assert(off.queryCost <= r.queryCost * 1.05, s"${r.name}: off=${off.queryCost} vs ${r.queryCost}")
  }

  test("delay increases query cost but not reorg cost") {
    val d0 = Lab.oreoAvg(workload, default, candidates, alpha, 1.0, 0.08, 0)
    val d40 = Lab.oreoAvg(workload, default, candidates, alpha, 1.0, 0.08, 40)
    assert(d40.queryCost >= d0.queryCost - 1e-9)
    assert(math.abs(d40.reorgCost - d0.reorgCost) < alpha + 1e-9)
  }

  test("larger alpha yields fewer layout changes") {
    val lo = Lab.oreoAvg(workload, default, candidates, 10, 1.0, 0.08, 0)
    val hi = Lab.oreoAvg(workload, default, candidates, 300, 1.0, 0.08, 0)
    assert(lo.switches >= hi.switches, s"lo=${lo.switches} hi=${hi.switches}")
  }

  test("oreo state space stays bounded") {
    val (_, strat) = Lab.runOreo(workload, default, candidates, alpha, 1.0, 0.08, 0, 1)
    assert(strat.maxStateSpaceSize <= 12)
    assert(strat.stateSpaceSize >= 1)
  }
}
