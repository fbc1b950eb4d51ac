package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.layout.{LayoutGen, RangeLayout}
import repro.workload.Workload
import scala.util.Random

/** Shared helpers for the experiment harnesses: building the default /
  * static / per-template-best layout states and seed-averaging MTS runs.
  */
object Lab {

  /** Collect the encoded dataset to a driver-local matrix for simulation. */
  def matrix(spark: SparkSession, ds: DatasetSpec, sf: Double): DataMatrix =
    DataMatrix.collect(ds.mkDf(spark, sf), ds.schema)

  /** The pre-optimization default layout: equi-depth range partitioning on
    * the dataset's arrival/sort column (§IV-A "start with a default layout").
    */
  def defaultState(data: DataMatrix, ds: DatasetSpec, k: Int): LayoutState = {
    val j = ds.schema.indexOf(ds.defaultCol)
    val layout = RangeLayout.equiDepth("default", ds.defaultCol, data.cols(j), k, ds.schema)
    CandidateStream.state(layout, data)
  }

  /** The Static baseline's layout: generated from a sample of the *entire*
    * workload (the paper estimates with ~2000 queries, §VI-A1).
    */
  def staticState(data: DataMatrix, workload: Workload, gen: LayoutGen, k: Int,
                  sampleQueries: Int = 2000, sampleRows: Int = 1000,
                  seed: Long = 5): LayoutState = {
    val rng = new Random(seed)
    val qs =
      if (workload.queries.size <= sampleQueries) workload.queries
      else Vector.fill(sampleQueries)(workload.queries(rng.nextInt(workload.queries.size)))
    val layout = gen.generate(data.sample(sampleRows, seed), qs, k, s"static-${gen.name}")
    CandidateStream.state(layout, data)
  }

  /** Best layout per query template (for the MTS-Optimal / Offline-Optimal
    * oracles, §VI-C): each is generated from queries of that template only.
    */
  def templateBest(data: DataMatrix, ds: DatasetSpec, gen: LayoutGen, k: Int,
                   perTemplate: Int = 200, sampleRows: Int = 1000,
                   seed: Long = 6): Map[Int, LayoutState] = {
    val rng = new Random(seed)
    ds.templates.indices.map { t =>
      val qs = Vector.tabulate(perTemplate)(i => Query(i, t, ds.templates(t).instantiate(rng)))
      val layout = gen.generate(data.sample(sampleRows, seed), qs, k, s"best-t$t-${gen.name}")
      t -> CandidateStream.state(layout, data)
    }.toMap
  }

  /** Average results of several seeds (the paper reports 3-run averages for
    * all methods using the randomized MTS algorithm).
    */
  def avg(results: Seq[SimResult]): SimResult = {
    require(results.nonEmpty)
    val n = results.size.toDouble
    val cums =
      if (results.head.cumulative.isEmpty) Vector.empty[Double]
      else results.map(_.cumulative).transpose.map(_.sum / n).toVector
    SimResult(results.head.name,
      results.map(_.queryCost).sum / n,
      results.map(_.reorgCost).sum / n,
      math.round(results.map(_.switches).sum / n).toInt,
      cums)
  }

  /** Run OREO over a workload with full wiring; returns the per-seed result
    * and the strategy (for state-space diagnostics).
    */
  def runOreo(workload: Workload, initial: LayoutState, candidates: Seq[Candidate],
              alpha: Double, gamma: Double, epsilon: Double, delay: Int,
              seed: Long, maxStates: Int = 12): (SimResult, OreoStrategy) = {
    val manager = new LayoutManager(epsilon, rng = new Random(seed * 31 + 7))
    val strat = new OreoStrategy(initial, alpha, gamma, manager, new Random(seed), maxStates)
    val res = Simulator.run(workload, initial, candidates, strat, alpha, delay)
    (res, strat)
  }

  /** 3-seed-averaged OREO run. */
  def oreoAvg(workload: Workload, initial: LayoutState, candidates: Seq[Candidate],
              alpha: Double, gamma: Double, epsilon: Double, delay: Int,
              seeds: Seq[Long] = Seq(1L, 2L, 3L)): SimResult =
    avg(seeds.map(s => runOreo(workload, initial, candidates, alpha, gamma, epsilon, delay, s)._1))
}
