package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class RtbsSpec extends AnyFunSuite {

  test("never exceeds capacity") {
    val r = new Rtbs[Int](10, 0.01, new Random(1))
    (1 to 1000).foreach(r.add)
    assert(r.size == 10)
  }

  test("holds everything while under capacity") {
    val r = new Rtbs[Int](50, 0.01, new Random(1))
    (1 to 20).foreach(r.add)
    assert(r.sample.sorted == (1 to 20))
  }

  test("sample is returned in arrival order") {
    val r = new Rtbs[Int](100, 0.0, new Random(1))
    Seq(5, 3, 9, 1).foreach(r.add)
    assert(r.sample == Seq(5, 3, 9, 1))
  }

  test("lambda=0 behaves like a uniform reservoir") {
    // averaged over trials, early and late halves should be near-equally
    // represented
    val trials = 200
    var early = 0
    for (seed <- 1 to trials) {
      val r = new Rtbs[Int](20, 0.0, new Random(seed))
      (1 to 1000).foreach(r.add)
      early += r.sample.count(_ <= 500)
    }
    val frac = early.toDouble / (trials * 20)
    assert(frac > 0.4 && frac < 0.6, s"uniform reservoir early fraction = $frac")
  }

  test("positive lambda biases toward recent items") {
    val trials = 100
    var recent = 0
    for (seed <- 1 to trials) {
      val r = new Rtbs[Int](20, 0.01, new Random(seed))
      (1 to 1000).foreach(r.add)
      recent += r.sample.count(_ > 500)
    }
    val frac = recent.toDouble / (trials * 20)
    assert(frac > 0.8, s"time-biased reservoir recent fraction = $frac")
  }

  test("stronger decay means stronger recency bias") {
    def recentFrac(lambda: Double): Double = {
      var recent = 0
      for (seed <- 1 to 50) {
        val r = new Rtbs[Int](20, lambda, new Random(seed))
        (1 to 2000).foreach(r.add)
        recent += r.sample.count(_ > 1800)
      }
      recent.toDouble / (50 * 20)
    }
    assert(recentFrac(0.05) > recentFrac(0.001))
  }

  test("deterministic for a fixed seed") {
    def s(seed: Long) = {
      val r = new Rtbs[Int](15, 0.005, new Random(seed))
      (1 to 500).foreach(r.add)
      r.sample
    }
    assert(s(9) == s(9))
  }
}
