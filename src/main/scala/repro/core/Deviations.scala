package repro.core

/** Result of one statistics-engine iteration (lines 8–14 of Algorithm 1).
  *
  * @param matching   the k candidate indices with smallest estimated tau
  *                   (the set M of Definition 3), sorted by tau ascending
  * @param eps        per-candidate deviation bounds chosen per Section 3.3
  * @param delta      per-candidate failure-probability upper bounds from
  *                   Theorem 1 (0 for exhausted candidates)
  * @param deltaUpper sum of delta — HistSim terminates when <= global delta
  * @param deltaMax   max of delta — SlowMatch terminates when <= delta/|V_Z|
  * @param active     AnyActive candidate set: delta(i) > delta/|V_Z|
  *                   (Section 4.2, Challenge 2)
  * @param splitPoint the split s between M and the rest (Double.NaN when
  *                   every candidate is in M)
  */
final case class Iteration(
    matching: Array[Int],
    eps: Array[Double],
    delta: Array[Double],
    deltaUpper: Double,
    deltaMax: Double,
    active: Array[Boolean],
    splitPoint: Double,
)

/** The deviation-selection step of HistSim (Section 3.3).
  *
  * Given current per-candidate (tau, n, exact) state it:
  *   1. sorts candidates by estimated distance tau and takes the k
  *      smallest as M;
  *   2. chooses the split point s halfway between the furthest candidate
  *      in M and the closest candidate outside M;
  *   3. assigns each candidate the largest deviation bound eps_i allowed
  *      by Lemma 2's constraints:
  *        i in M:     eps_i = min(eps, s + eps/2 - tau_i)
  *        j not in M: eps_j = max(0, tau_j - max(s - eps/2, 0))
  *   4. converts (eps_i, n_i) into failure probabilities delta_i via
  *      Theorem 1, with delta_i = 0 for exhausted candidates (their
  *      histograms are exact, so deviation is 0 with certainty).
  */
object Deviations {

  /** Run one iteration. `state.tau` must be fresh for all candidates whose
    * counts changed since the last call.
    */
  def iterate(state: HistSimState, k: Int, eps: Double, delta: Double): Iteration =
    iterate(state, k, eps, eps, delta)

  /** Appendix A.2.1 generalization: distinct tolerances for the two
    * guarantees — `epsSep` for separation (Guarantee 1, the split-point
    * fences) and `epsRec` for reconstruction (Guarantee 2, the cap on
    * matching candidates' deviations). The paper's default is
    * epsSep = epsRec = eps.
    */
  def iterate(state: HistSimState, k: Int, epsSep: Double, epsRec: Double,
              delta: Double): Iteration = {
    val nz = state.nCandidates
    require(k >= 1, s"k must be >= 1, got $k")
    require(epsSep > 0 && epsRec > 0 && delta > 0 && delta < 1,
      s"bad (epsSep=$epsSep, epsRec=$epsRec, delta=$delta)")

    val order = Array.range(0, nz).sortBy(state.tau)
    val kk = math.min(k, nz)
    val matching = order.take(kk)

    val epsOut = new Array[Double](nz)
    val deltaOut = new Array[Double](nz)
    val active = new Array[Boolean](nz)

    val splitPoint =
      if (kk >= nz) Double.NaN
      else (state.tau(order(kk - 1)) + state.tau(order(kk))) / 2.0

    val inM = new Array[Boolean](nz)
    matching.foreach(inM(_) = true)

    val lowerFence = if (splitPoint.isNaN) 0.0 else math.max(splitPoint - epsSep / 2.0, 0.0)
    var i = 0
    while (i < nz) {
      epsOut(i) =
        if (inM(i)) {
          // Constraint 2 (reconstruction) caps at epsRec; constraint 1
          // caps at s + epsSep/2 - tau_i. With no split (all candidates
          // in M) only the reconstruction cap applies.
          if (splitPoint.isNaN) epsRec
          else math.min(epsRec, splitPoint + epsSep / 2.0 - state.tau(i))
        } else {
          math.max(0.0, state.tau(i) - lowerFence)
        }
      deltaOut(i) =
        if (state.exact(i)) 0.0
        else Bounds.deltaFor(state.n(i), epsOut(i), state.vx)
      i += 1
    }

    var sum = 0.0; var max = 0.0
    val activeThreshold = delta / nz
    i = 0
    while (i < nz) {
      sum += deltaOut(i)
      if (deltaOut(i) > max) max = deltaOut(i)
      active(i) = deltaOut(i) > activeThreshold
      i += 1
    }

    Iteration(matching, epsOut, deltaOut, sum, max, active, splitPoint)
  }

  /** Appendix A.2.3: when the analyst accepts any k in [k1, k2], pick the
    * k whose boundary has the largest distance gap between the k-th and
    * (k+1)-th closest candidates — separation is then easiest to certify
    * and deltaUpper shrinks soonest.
    */
  def chooseK(state: HistSimState, k1: Int, k2: Int): Int = {
    val nz = state.nCandidates
    require(k1 >= 1 && k2 >= k1, s"bad range [$k1, $k2]")
    val hi = math.min(k2, nz)
    if (k1 >= nz) return nz
    val sorted = state.tau.sorted
    var bestK = k1
    var bestGap = Double.NegativeInfinity
    var k = k1
    while (k <= hi) {
      val gap = if (k >= nz) Double.PositiveInfinity else sorted(k) - sorted(k - 1)
      if (gap > bestGap) { bestGap = gap; bestK = k }
      k += 1
    }
    bestK
  }
}
