package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import TestLayouts._

class StrategiesSpec extends AnyFunSuite {

  private val defaultState = state("default", Set.empty) // cost 1.0 for everything

  // ---------- Static ----------
  test("static never switches") {
    val s = new StaticStrategy(defaultState)
    (0 until 50).foreach(i => assert(s.observe(query(i % 10, i)).isEmpty))
    assert(s.onCandidate(state("better", Set(1))).isEmpty)
    assert(s.current.id == "default")
  }

  // ---------- Greedy ----------
  test("greedy switches to a cheaper candidate immediately") {
    val g = new GreedyStrategy(defaultState, windowSize = 10)
    (0 until 10).foreach(i => g.observe(query(3, i)))
    val better = state("good3", Set(3))
    assert(g.onCandidate(better).map(_.id).contains("good3"))
    assert(g.current.id == "good3")
  }

  test("greedy ignores a worse candidate") {
    val good = state("good3", Set(3))
    val g = new GreedyStrategy(good, windowSize = 10)
    (0 until 10).foreach(i => g.observe(query(3, i)))
    assert(g.onCandidate(state("bad", Set(9))).isEmpty)
    assert(g.current.id == "good3")
  }

  test("greedy ignores candidates before any query arrives") {
    val g = new GreedyStrategy(defaultState)
    assert(g.onCandidate(state("good3", Set(3))).isEmpty)
  }

  test("greedy judges on the sliding window, not history") {
    val g = new GreedyStrategy(defaultState, windowSize = 5)
    (0 until 50).foreach(i => g.observe(query(1, i))) // old interest: 1
    (0 until 5).foreach(i => g.observe(query(7, 50 + i))) // window now all 7s
    assert(g.onCandidate(state("good7", Set(7))).isDefined) // wins on the window
    // despite 50 historical queries on 1, the stale candidate loses the window
    assert(g.onCandidate(state("good1", Set(1))).isEmpty)
  }

  test("greedy switches on every improvement, ignoring reorganization cost") {
    // drifting workload: blocks of 8 queries per value; a fresh specialized
    // candidate at each block end beats the previous one every time
    val g = new GreedyStrategy(defaultState, windowSize = 4)
    var switches = 0
    for (i <- 0 until 80) {
      g.observe(query((i / 8) % 10, i))
      if (i % 8 == 7 && g.onCandidate(state(s"cand$i", Set((i / 8) % 10))).isDefined)
        switches += 1
    }
    assert(switches >= 5, s"greedy should thrash; switched $switches times")
  }

  // ---------- Regret ----------
  test("regret waits until cumulative savings exceed alpha") {
    val alpha = 3.0
    val r = new RegretStrategy(defaultState, alpha)
    val better = state("good3", Set(3)) // saves 1.0 - 0.1 = 0.9 per query(3)
    assert(r.onCandidate(better).isEmpty) // no history yet
    // need ceil(3 / 0.9) = 4 queries of savings
    assert(r.observe(query(3, 0)).isEmpty)
    assert(r.observe(query(3, 1)).isEmpty)
    assert(r.observe(query(3, 2)).isEmpty)
    val dec = r.observe(query(3, 3))
    assert(dec.map(_.id).contains("good3"))
    assert(r.current.id == "good3")
  }

  test("regret retroactively credits new candidates with history") {
    val alpha = 3.0
    val r = new RegretStrategy(defaultState, alpha)
    (0 until 10).foreach(i => assert(r.observe(query(3, i)).isEmpty)) // no candidates yet
    // candidate arrives late, but 10 queries × 0.9 savings > alpha: switch now
    val dec = r.onCandidate(state("good3", Set(3)))
    assert(dec.map(_.id).contains("good3"))
  }

  test("regret resets savings after a switch") {
    val alpha = 2.0
    val r = new RegretStrategy(defaultState, alpha)
    r.onCandidate(state("good3", Set(3)))
    (0 until 3).foreach(i => r.observe(query(3, i)))
    assert(r.current.id == "good3")
    val switchesBefore = r.current.id
    // keep querying 3: the adopted state is optimal, no further switches
    (0 until 20).foreach(i => assert(r.observe(query(3, 10 + i)).isEmpty))
    assert(r.current.id == switchesBefore)
  }

  test("regret does not switch when savings never accumulate") {
    val r = new RegretStrategy(state("good", (0 until 9).toSet), alpha = 5.0)
    r.onCandidate(state("alt", Set(0))) // worse than current for most queries
    (0 until 30).foreach(i => assert(r.observe(query(i % 9, i)).isEmpty))
    assert(r.current.id == "good")
  }

  test("regret caps the alternative set") {
    val r = new RegretStrategy(defaultState, alpha = 1e9, maxAlternatives = 3)
    (0 until 10).foreach(i => r.observe(query(i % 10, i)))
    (0 until 10).foreach(i => r.onCandidate(state(s"c$i", Set(i))))
    // no way to observe internals directly; just ensure no crash and no switch
    assert(r.current.id == "default")
  }

  // ---------- OREO ----------
  private def oreo(alpha: Double = 5.0, gamma: Double = 1.0, eps: Double = 0.05,
                   maxStates: Int = 4, seed: Long = 1): OreoStrategy = {
    val mgr = new LayoutManager(eps, sampleCapacity = 20, lambda = 0.0, rng = new Random(seed + 100))
    new OreoStrategy(defaultState, alpha, gamma, mgr, new Random(seed), maxStates)
  }

  test("oreo admits a useful candidate and eventually switches to it") {
    val o = oreo(alpha = 2.0)
    (0 until 10).foreach(i => o.observe(query(3, i)))
    o.onCandidate(state("good3", Set(3)))
    assert(o.stateSpaceSize == 2)
    // keep querying 3: default's counter fills (cost 1.0 each), good3 stays
    var switched = false
    (0 until 20).foreach { i =>
      if (o.observe(query(3, 10 + i)).isDefined) switched = true
    }
    assert(switched)
    assert(o.current.id == "good3")
  }

  test("oreo rejects near-duplicate candidates") {
    val o = oreo(eps = 0.05)
    (0 until 20).foreach(i => o.observe(query(i % 10, i)))
    o.onCandidate(state("a", Set(1, 2)))
    o.onCandidate(state("a-dup", Set(1, 2)))
    assert(o.stateSpaceSize == 2) // default + a
    assert(o.admittedCount == 1)
    assert(o.offeredCount == 2)
  }

  test("oreo caps the state space via eviction") {
    val o = oreo(maxStates = 3, eps = 0.0)
    (0 until 20).foreach(i => o.observe(query(i % 10, i)))
    for (i <- 0 until 8) o.onCandidate(state(s"c$i", Set(i)))
    assert(o.stateSpaceSize <= 3)
    assert(o.maxStateSpaceSize <= 3)
  }

  test("oreo onCandidate never reports a switch") {
    val o = oreo(maxStates = 2, eps = 0.0)
    (0 until 20).foreach(i => o.observe(query(i % 10, i)))
    for (i <- 0 until 8) assert(o.onCandidate(state(s"c$i", Set(i))).isEmpty)
  }

  test("oreo is deterministic given seeds") {
    def run(seed: Long): Seq[String] = {
      val o = oreo(alpha = 1.5, seed = seed)
      (0 until 100).map { i =>
        if (i % 10 == 0) o.onCandidate(state(s"c${i / 10}", Set(i / 10)))
        o.observe(query(i % 7, i))
        o.current.id
      }
    }
    assert(run(5) == run(5))
  }

  // ---------- MTS Optimal ----------
  test("mts-optimal switches within its fixed state space") {
    val fixed = (0 until 5).map(v => state(s"best$v", Set(v)))
    val m = new MtsOptimalStrategy(defaultState, fixed, alpha = 2.0, gamma = 1.0, new Random(2))
    (0 until 60).foreach(i => m.observe(query(4, i)))
    // the system must end up in a cheap state for the workload (cost <= 0.5)
    assert(m.current.cost(query(4)) < 1.0)
  }

  test("mts-optimal ignores candidates") {
    val m = new MtsOptimalStrategy(defaultState, Seq(state("b", Set(1))),
      alpha = 2.0, gamma = 0.0, new Random(2))
    assert(m.onCandidate(state("x", Set(2))).isEmpty)
  }
}
