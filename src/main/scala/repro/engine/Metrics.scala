package repro.engine

import repro.core.Hist
import repro.engine.GroundTruth.Truth

/** Accuracy metrics of Section 5.3, evaluated against the exact answer. */
object Metrics {

  /** Guarantee 1 (SEPARATION): every true-top-k candidate missing from
    * the output is less than eps closer to the target than the furthest
    * returned candidate — using *true* distances.
    */
  def separationHolds(matching: Array[Int], truth: Truth, eps: Double): Boolean = {
    val out = matching.toSet
    if (truth.topK.forall(out.contains)) true
    else {
      val maxOut = matching.map(truth.tau).max
      truth.topK.filterNot(out.contains).forall(j => maxOut - truth.tau(j) < eps)
    }
  }

  /** Guarantee 2 (RECONSTRUCTION): each returned empirical histogram is
    * within eps (l1, normalized) of the candidate's true histogram.
    */
  def reconstructionHolds(matching: Array[Int], counts: Array[Array[Long]],
                          truth: Truth, eps: Double): Boolean =
    matching.forall { i =>
      Hist.l1(Hist.normalize(counts(i)), Hist.normalize(truth.hists(i))) < eps
    }

  /** Total relative error in visual distance Delta_d (Section 5.3):
    * excess true distance of the returned set over the optimal set,
    * relative to the optimal set's total distance. Always >= 0.
    */
  def deltaD(matching: Array[Int], truth: Truth): Double = {
    val got = matching.map(truth.tau).sum
    val best = truth.topK.map(truth.tau).sum
    require(best > 0 || got == best, "degenerate truth: zero total distance")
    if (best == 0.0) 0.0 else (got - best) / best
  }
}
