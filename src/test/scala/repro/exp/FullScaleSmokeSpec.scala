package repro.exp

import repro.SparkSpec
import repro.core.CandidateStream.{GenConfig, SW}
import repro.core._
import repro.layout.QdTreeGen

/** One full-length-stream run on TPCH (30k queries, 20 segments — the
  * paper's workload shape) asserting the headline qualitative findings of
  * §VI-B. The full cross-dataset sweeps live in bench/.
  */
class FullScaleSmokeSpec extends SparkSpec {

  private val alpha = 80.0

  private lazy val results: Map[String, SimResult] = {
    val ds = Datasets.tpch
    val data = Lab.matrix(spark, ds, 0.02)
    val workload = ds.mkWorkload(30000, 20, 42)
    val default = Lab.defaultState(data, ds, 32)
    val candidates = CandidateStream.compute(workload, data, QdTreeGen, SW, GenConfig(k = 32))
    val static = Lab.staticState(data, workload, QdTreeGen, 32)
    Map(
      "static" -> Simulator.run(workload, static, Nil, new StaticStrategy(static), alpha),
      "default" -> Simulator.run(workload, default, Nil, new StaticStrategy(default), alpha),
      "greedy" -> Simulator.run(workload, default, candidates, new GreedyStrategy(default), alpha),
      "regret" -> Simulator.run(workload, default, candidates, new RegretStrategy(default, alpha), alpha),
      "oreo" -> Lab.oreoAvg(workload, default, candidates, alpha, 1.0, 0.08, 0),
    )
  }

  test("OREO beats the optimized static layout at full stream length") {
    assert(results("oreo").totalCost < results("static").totalCost,
      s"oreo=${results("oreo").totalCost} static=${results("static").totalCost}")
  }

  test("everything beats the naive default layout") {
    for (m <- Seq("static", "greedy", "regret", "oreo"))
      assert(results(m).totalCost < results("default").totalCost, m)
  }

  test("greedy has the lowest query cost but pays heavy reorganization") {
    val g = results("greedy")
    assert(g.queryCost <= results("oreo").queryCost)
    assert(g.queryCost <= results("regret").queryCost)
    assert(g.reorgCost >= results("oreo").reorgCost)
    assert(g.reorgCost >= results("regret").reorgCost)
  }

  test("regret is the most conservative reorganizer") {
    assert(results("regret").switches <= results("oreo").switches)
    assert(results("regret").switches <= results("greedy").switches)
  }

  test("OREO achieves the best total cost among online strategies") {
    val others = Seq("greedy", "regret").map(results(_).totalCost)
    assert(results("oreo").totalCost <= others.min * 1.05,
      s"oreo=${results("oreo").totalCost} others=$others")
  }
}
