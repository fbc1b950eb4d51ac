package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.CandidateStream.{GenConfig, SW}
import repro.core._
import repro.layout.{LayoutGen, QdTreeGen, ZOrderGen}
import scala.util.Random

/** Figure 3 reproduction: total query + reorganization cost of Static,
  * Greedy, Regret and OREO, for Qd-tree and Z-order layout generation, on
  * the three datasets.
  *
  * Costs are logical (fraction-of-data units; the paper's own proxy) and
  * are optionally converted to seconds using a physically measured pair
  * (full-scan seconds, reorg seconds) from the Table I harness.
  */
object Figure3Exp {

  final case class Cell(method: String, gen: String, queryCost: Double,
                        reorgCost: Double, switches: Int) {
    def totalCost: Double = queryCost + reorgCost
    /** Convert logical costs into seconds: query cost is in full-scan units
      * and each reorganization costs one physical rewrite.
      */
    def seconds(scanSec: Double, reorgSec: Double): (Double, Double) =
      (queryCost * scanSec, switches * reorgSec)
  }

  final case class DatasetResult(dataset: String, cells: Seq[Cell]) {
    def apply(method: String, gen: String): Cell =
      cells.find(c => c.method == method && c.gen == gen).get
  }

  def runDataset(spark: SparkSession, ds: DatasetSpec, sf: Double, scale: Double = 1.0,
                 alpha: Double = 80, epsilon: Double = 0.08, k: Int = 32,
                 gens: Seq[LayoutGen] = Seq(QdTreeGen, ZOrderGen),
                 seeds: Seq[Long] = Seq(1L, 2L, 3L)): DatasetResult = {
    val nQ = math.max(400, (ds.paperQueries * scale).toInt)
    val workload = ds.mkWorkload(nQ, ds.paperSegments, 42 + ds.name.hashCode % 97)
    val data = Lab.matrix(spark, ds, sf)
    val default = Lab.defaultState(data, ds, k)
    val cells = for (gen <- gens) yield {
      val candidates = CandidateStream.compute(workload, data, gen, SW, GenConfig(k = k))
      val static = Lab.staticState(data, workload, gen, k)

      val staticRes = Simulator.run(workload, static, Nil, new StaticStrategy(static), alpha)
      val greedyRes = Simulator.run(workload, default, candidates,
        new GreedyStrategy(default), alpha)
      val regretRes = Simulator.run(workload, default, candidates,
        new RegretStrategy(default, alpha), alpha)
      val oreoRes = Lab.oreoAvg(workload, default, candidates, alpha, 1.0, epsilon, 0, seeds)

      Seq(staticRes, greedyRes, regretRes, oreoRes).map { r =>
        Cell(r.name, gen.name, r.queryCost, r.reorgCost, r.switches)
      }
    }
    DatasetResult(ds.name, cells.flatten)
  }

  def format(results: Seq[DatasetResult]): String = {
    val sb = new StringBuilder
    sb.append(f"${"dataset"}%-10s ${"gen"}%-8s ${"method"}%-8s ${"query"}%-10s ${"reorg"}%-10s ${"total"}%-10s ${"switches"}%-8s\n")
    for (dr <- results; c <- dr.cells)
      sb.append(f"${dr.dataset}%-10s ${c.gen}%-8s ${c.method}%-8s ${c.queryCost}%-10.1f ${c.reorgCost}%-10.1f ${c.totalCost}%-10.1f ${c.switches}%-8d\n")
    sb.toString
  }

  /** A small physical end-to-end validation of the logical proxy: runs a
    * random sample of `nPhysical` rewritten (BID-filtered) queries on the
    * Parquet table and reports (fraction accessed, seconds) pairs, which
    * should correlate positively (see EXPERIMENTS.md).
    */
  def proxyCheck(spark: SparkSession, ds: DatasetSpec, sf: Double, tablePath: String,
                 state: LayoutState, nPhysical: Int = 20, seed: Long = 3): Seq[(Double, Double)] = {
    import repro.spark.{BidTable, PhysicalReorg}
    val rng = new Random(seed)
    val table = BidTable.read(spark, tablePath)
    val wl = ds.mkWorkload(1000, ds.paperSegments, 99)
    (1 to nPhysical).map { _ =>
      val q = wl.queries(rng.nextInt(wl.queries.size))
      val frac = state.cost(q)
      val sec = PhysicalReorg.timed {
        BidTable.rewrite(table, q, state.metadata).count()
      }
      (frac, sec)
    }
  }
}
