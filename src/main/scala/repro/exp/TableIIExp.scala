package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core.CandidateStream.{GenConfig, RS, SW, SWRS}
import repro.core._
import repro.layout.QdTreeGen

/** Table II reproduction: impact of the transition distribution (γ), of the
  * candidate-generation source (sliding window vs reservoir sampling), and
  * of the reorganization delay (Δ) on the MTS algorithm, in logical costs
  * from simulation (units of 10³), for TPCH / TPCDS / Telemetry.
  *
  * Paper defaults (bold rows): γ=1, SW, Δ=0, with α=80, ε=0.08, window=200.
  */
object TableIIExp {

  /** One configuration row of the table. */
  final case class RowSpec(label: String, source: CandidateStream.Source,
                           gamma: Double, delay: Int)

  val rows: Seq[RowSpec] = Seq(
    RowSpec("default", SW, 1, 0),
    RowSpec("gamma=0", SW, 0, 0),
    RowSpec("gamma=2", SW, 2, 0),
    RowSpec("gamma=3", SW, 3, 0),
    RowSpec("SW",      SW, 1, 0),
    RowSpec("RS",      RS, 1, 0),
    RowSpec("SW+RS",   SWRS, 1, 0),
    RowSpec("delta=0", SW, 1, 0),
    RowSpec("delta=40", SW, 1, 40),
    RowSpec("delta=80", SW, 1, 80),
  )

  /** queryCost and reorgCost in units of 10³ logical cost. */
  final case class Cell(queryCost: Double, reorgCost: Double, switches: Int)

  final case class Result(cells: Map[(String, String), Cell], datasets: Seq[String]) {
    def apply(row: String, ds: String): Cell = cells((row, ds))
  }

  /** Run the full grid.
    *
    * @param sf        dataset scale factor
    * @param nQueries  stream length (paper: 30k / 30k / 24k); `scale` < 1
    *                  shrinks all streams proportionally for quick runs
    * @param alpha     relative reorganization cost (paper default 80)
    * @param epsilon   admission threshold (paper default 0.08)
    */
  def run(spark: SparkSession, sf: Double, scale: Double = 1.0, alpha: Double = 80,
          epsilon: Double = 0.08, k: Int = 32,
          seeds: Seq[Long] = Seq(1L, 2L, 3L),
          datasets: Seq[DatasetSpec] = Datasets.all): Result = {
    val cells = for (ds <- datasets) yield {
      val nQ = math.max(400, (ds.paperQueries * scale).toInt)
      val nSeg = ds.paperSegments
      val workload = ds.mkWorkload(nQ, nSeg, 42 + ds.name.hashCode % 97)
      val data = Lab.matrix(spark, ds, sf)
      val default = Lab.defaultState(data, ds, k)
      val genCfg = GenConfig(k = k)
      // candidates are shared across all rows that use the same source
      val bySource = Map[CandidateStream.Source, Seq[Candidate]](
        SW -> CandidateStream.compute(workload, data, QdTreeGen, SW, genCfg),
        RS -> CandidateStream.compute(workload, data, QdTreeGen, RS, genCfg),
        SWRS -> CandidateStream.compute(workload, data, QdTreeGen, SWRS, genCfg),
      )
      for (row <- rows) yield {
        val res = Lab.oreoAvg(workload, default, bySource(row.source),
          alpha, row.gamma, epsilon, row.delay, seeds)
        (row.label, ds.name) -> Cell(res.queryCost / 1e3, res.reorgCost / 1e3, res.switches)
      }
    }
    Result(cells.flatten.toMap, datasets.map(_.name))
  }

  /** Render the measured grid in the paper's layout. */
  def format(r: Result): String = {
    val sb = new StringBuilder
    sb.append(f"${"row"}%-10s | ${"Query Cost (x10^3)"}%-34s | ${"Reorg Cost (x10^3)"}%-34s\n")
    sb.append(f"${""}%-10s | ${r.datasets.map(d => f"$d%-10s").mkString(" ")} | " +
      s"${r.datasets.map(d => f"$d%-10s").mkString(" ")}\n")
    for (row <- rows) {
      val q = r.datasets.map(d => f"${r(row.label, d).queryCost}%-10.2f").mkString(" ")
      val g = r.datasets.map(d => f"${r(row.label, d).reorgCost}%-10.2f").mkString(" ")
      sb.append(f"${row.label}%-10s | $q | $g\n")
    }
    sb.toString
  }
}
