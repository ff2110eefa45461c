package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.GroundTruth.Truth

class MetricsSpec extends AnyFunSuite {

  /** Truth with 5 candidates at distances 0.1, 0.2, 0.4, 0.8, 1.0 and
    * simple two-bin histograms.
    */
  private def toyTruth: Truth = {
    val tau = Array(0.1, 0.2, 0.4, 0.8, 1.0)
    val hists = Array(
      Array(50L, 50L), Array(60L, 40L), Array(70L, 30L), Array(90L, 10L), Array(99L, 1L))
    Truth(Array(0.5, 0.5), hists, tau, Array(0, 1))
  }

  test("separation holds for the exact top-k") {
    assert(Metrics.separationHolds(Array(0, 1), toyTruth, eps = 0.05))
  }

  test("separation holds for a near-miss within eps") {
    // output {0, 2} instead of {0, 1}: max returned true tau = 0.4,
    // missing candidate 1 at 0.2 => 0.4 - 0.2 = 0.2 < eps = 0.25
    assert(Metrics.separationHolds(Array(0, 2), toyTruth, eps = 0.25))
  }

  test("separation fails for a bad swap") {
    // output {0, 4}: 1.0 - 0.2 = 0.8 >= 0.25
    assert(!Metrics.separationHolds(Array(0, 4), toyTruth, eps = 0.25))
  }

  test("reconstruction holds when empirical counts mirror the truth") {
    val t = toyTruth
    // scaled copies of the true histograms: zero normalized distance
    val counts = t.hists.map(_.map(_ * 3))
    assert(Metrics.reconstructionHolds(Array(0, 1), counts, t, eps = 0.01))
  }

  test("reconstruction fails for a distorted histogram") {
    val t = toyTruth
    val counts = Array(
      Array(10L, 90L), // true is 50/50: l1 distance 0.8
      t.hists(1).clone(), t.hists(2).clone(), t.hists(3).clone(), t.hists(4).clone())
    assert(!Metrics.reconstructionHolds(Array(0, 1), counts, t, eps = 0.5))
    assert(Metrics.reconstructionHolds(Array(1), counts, t, eps = 0.5))
  }

  test("deltaD is zero for the optimal set") {
    assert(Metrics.deltaD(Array(0, 1), toyTruth) == 0.0)
    assert(Metrics.deltaD(Array(1, 0), toyTruth) == 0.0) // order-insensitive
  }

  test("deltaD is positive and correctly scaled for a suboptimal set") {
    // got = 0.1 + 0.4 = 0.5, best = 0.3 => (0.5 - 0.3) / 0.3
    val d = Metrics.deltaD(Array(0, 2), toyTruth)
    assert(math.abs(d - 0.2 / 0.3) < 1e-12)
  }

  test("deltaD is never negative across random output sets") {
    val t = toyTruth
    val rng = new java.util.Random(4)
    for (_ <- 0 until 50) {
      val out = rng.ints(0, 5).distinct().limit(2).toArray
      if (out.length == 2) assert(Metrics.deltaD(out, t) >= 0.0)
    }
  }
}
