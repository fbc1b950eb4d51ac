package repro.exp

import java.nio.file.Files
import repro.SparkSpec

/** Wiring tests for the table/figure harnesses at miniature scale; the
  * full-scale runs live in the bench/ suites.
  */
class ExpHarnessSpec extends SparkSpec {

  test("TableIIExp runs the grid and fills every cell") {
    val r = TableIIExp.run(spark, sf = 0.003, scale = 0.04, alpha = 40,
      seeds = Seq(1L), datasets = Seq(Datasets.tpch))
    for (row <- TableIIExp.rows) {
      val c = r(row.label, "TPCH")
      assert(c.queryCost > 0)
      assert(c.reorgCost >= 0)
    }
    val txt = TableIIExp.format(r)
    assert(txt.contains("default") && txt.contains("gamma=0"))
  }

  test("TableIIExp: default and the SW row coincide") {
    val r = TableIIExp.run(spark, sf = 0.003, scale = 0.04, alpha = 40,
      seeds = Seq(2L), datasets = Seq(Datasets.tpch))
    assert(r("default", "TPCH") == r("SW", "TPCH"))
    assert(r("default", "TPCH") == r("delta=0", "TPCH"))
  }

  test("Figure3Exp covers all four methods and both generators") {
    val dr = Figure3Exp.runDataset(spark, Datasets.tpch, sf = 0.003, scale = 0.04,
      alpha = 40, seeds = Seq(1L))
    val methods = dr.cells.map(_.method).toSet
    assert(methods == Set("Static", "Greedy", "Regret", "OREO"))
    assert(dr.cells.map(_.gen).toSet == Set("qdtree", "zorder"))
    assert(Figure3Exp.format(Seq(dr)).contains("OREO"))
    val (qSec, rSec) = dr("OREO", "qdtree").seconds(2.0, 100.0)
    assert(qSec > 0 && rSec >= 0)
  }

  test("GapExp orders the oracles sensibly") {
    val r = GapExp.run(spark, Datasets.tpch, sf = 0.003, scale = 0.04,
      alpha = 40, seeds = Seq(1L))
    assert(r.offline.queryCost <= r.mtsOpt.queryCost * 1.05)
    assert(r.offline.queryCost <= r.oreo.queryCost * 1.05)
    assert(GapExp.format(Seq(r)).contains("Offline"))
  }

  test("SweepExp alpha sweep reduces switches as alpha grows") {
    val ps = SweepExp.alphaSweep(spark, Datasets.tpch, sf = 0.003, scale = 0.04,
      alphas = Seq(5, 200), seeds = Seq(1L))
    assert(ps.size == 2)
    assert(ps.head.switches >= ps.last.switches)
    assert(SweepExp.formatAlpha(ps).nonEmpty)
  }

  test("SweepExp epsilon sweep shrinks the state space as epsilon grows") {
    val ps = SweepExp.epsilonSweep(spark, Datasets.tpch, sf = 0.003, scale = 0.04,
      epsilons = Seq(0.0, 0.9), alpha = 40, seeds = Seq(1L))
    assert(ps.head.maxStates >= ps.last.maxStates)
    assert(SweepExp.formatEps(ps).nonEmpty)
  }

  test("TableIExp measures plausible physical timings") {
    // At 20k rows both timings sit at Spark's fixed per-job overhead floor,
    // so only wiring is asserted here; the α >> 1 claim is measured at real
    // file sizes in bench/TableIBench.
    val dir = Files.createTempDirectory("tableI").toString
    val row = TableIExp.measure(spark, rows = 20000, workDir = dir, k = 8, reps = 1)
    assert(row.fileMb > 0)
    assert(row.querySec > 0 && row.reorgSec > 0)
    assert(row.alpha > 0.2, s"reorg far cheaper than a scan is a wiring bug: $row")
    assert(TableIExp.format(Seq(row)).contains("alpha"))
  }
}
