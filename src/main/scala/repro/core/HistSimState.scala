package repro.core

/** Mutable per-candidate state for one HistSim run.
  *
  * Tracks, for each candidate i in [0, nCandidates):
  *   - `n(i)`       — samples taken so far (tuples observed),
  *   - `counts(i)`  — the empirical histogram over the |V_X| groups,
  *   - `tau(i)`     — l1 distance of the normalized empirical histogram
  *                    from the (already normalized) target Q-hat,
  *   - `exact(i)`   — whether candidate i's data has been exhausted
  *                    (every block containing it was read), in which case
  *                    its histogram is the true one and its deviation is 0.
  *
  * `tau` is maintained incrementally: only candidates touched by a batch
  * of new counts are recomputed (O(touched * |V_X|)), which is what makes
  * a per-block SyncMatch simulation tractable while preserving the
  * O(|V_Z| * |V_X|) complexity the paper charges per statistics iteration.
  */
final class HistSimState(val nCandidates: Int, val target: Array[Double]) {
  val vx: Int = target.length
  require(vx >= 1, "target must be non-empty")

  val n: Array[Long] = new Array[Long](nCandidates)
  val counts: Array[Array[Long]] = Array.fill(nCandidates)(new Array[Long](vx))
  val tau: Array[Double] = Array.fill(nCandidates)(Hist.l1(new Array[Double](vx), target))
  val exact: Array[Boolean] = new Array[Boolean](nCandidates)

  /** Add `c` observed tuples with group value `x` for candidate `z`.
    * Does NOT refresh tau — call [[refreshTau]] once per batch.
    */
  def add(z: Int, x: Int, c: Long): Unit = {
    require(c >= 0, s"negative count $c")
    counts(z)(x) += c
    n(z) += c
  }

  /** Recompute tau for the given candidates (after a batch of adds). */
  def refreshTau(touched: Iterable[Int]): Unit =
    touched.foreach { z => tau(z) = Hist.dist(counts(z), target) }

  /** Recompute tau for every candidate (used by tests as the oracle for
    * the incremental path, and at initialization).
    */
  def refreshAllTau(): Unit = {
    var z = 0
    while (z < nCandidates) { tau(z) = Hist.dist(counts(z), target); z += 1 }
  }

  def markExact(z: Int): Unit = exact(z) = true

  def totalSamples: Long = n.sum

  /** Normalized empirical histogram of candidate z. */
  def distribution(z: Int): Array[Double] = Hist.normalize(counts(z))
}
