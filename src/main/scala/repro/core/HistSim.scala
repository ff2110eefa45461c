package repro.core

/** Source of samples for the abstract HistSim loop (line 7 of
  * Algorithm 1: "Take some samples"). Implementations decide which
  * tuples to fetch — uniformly at random, block-sequentially, guided by
  * the active-candidate set, etc. HistSim itself is agnostic (Section 3.1).
  */
trait Sampler {

  /** Fetch the next round of samples. Each triple is
    * (candidate index z, group index x, tuple count). The `active` hint
    * marks candidates whose confidence is still above the per-candidate
    * threshold; samplers may use it to prioritize. An empty result means
    * the source is exhausted for this round's request.
    */
  def nextRound(active: Array[Boolean]): Array[(Int, Int, Int)]

  /** Candidates whose entire population has now been observed. Their
    * empirical histograms are exact (sampling without replacement).
    */
  def exhausted(): Set[Int]
}

/** Termination criteria for the statistics engine. */
sealed trait Criterion
object Criterion {
  /** HistSim's criterion: sum_i delta_i <= delta (Theorem 2's union
    * bound) — lets deviation bounds "borrow statistical strength".
    */
  case object SumDelta extends Criterion

  /** SlowMatch's criterion (Section 5.2): max_i delta_i <= delta/|V_Z|,
    * i.e. fixed-width per-candidate confidence, strictly more demanding.
    */
  case object MaxDelta extends Criterion
}

/** Output of a HistSim run.
  *
  * @param matching   candidate indices estimated as top-k, tau-ascending
  * @param histograms empirical (normalized) histograms for all candidates
  * @param tau        final estimated distances from the target
  * @param rounds     number of sampling rounds executed
  * @param samples    total tuples observed
  * @param deltaUpper final bound on the probability any guarantee fails
  */
final case class HistSimResult(
    matching: Array[Int],
    histograms: Array[Array[Double]],
    tau: Array[Double],
    rounds: Int,
    samples: Long,
    deltaUpper: Double,
)

/** Algorithm 1: the high-level HistSim loop. Repeatedly samples, updates
  * candidate state, selects deviation bounds (Section 3.3), and checks
  * the termination criterion. Returns the estimated top-k with the
  * separation and reconstruction guarantees holding with probability
  * > 1 - delta (Theorem 2).
  */
object HistSim {

  def run(
      nCandidates: Int,
      target: Array[Double],
      sampler: Sampler,
      k: Int,
      eps: Double,
      delta: Double,
      criterion: Criterion = Criterion.SumDelta,
      maxRounds: Int = Int.MaxValue,
  ): HistSimResult = {
    val state = new HistSimState(nCandidates, target)
    var iter = Deviations.iterate(state, k, eps, delta)
    var rounds = 0

    def terminated(it: Iteration): Boolean = criterion match {
      case Criterion.SumDelta => it.deltaUpper <= delta
      case Criterion.MaxDelta => it.deltaMax <= delta / nCandidates
    }

    var done = terminated(iter)
    while (!done && rounds < maxRounds) {
      val batch = sampler.nextRound(iter.active)
      rounds += 1
      if (batch.nonEmpty) {
        val touched = scala.collection.mutable.Set.empty[Int]
        batch.foreach { case (z, x, c) => state.add(z, x, c); touched += z }
        state.refreshTau(touched)
      }
      sampler.exhausted().foreach(state.markExact)
      iter = Deviations.iterate(state, k, eps, delta)
      // An exhausted sampler with a still-unmet criterion cannot improve:
      // stop rather than loop forever (only possible when not every
      // candidate's population was observable).
      done = terminated(iter) || (batch.isEmpty && sampler.exhausted().size < nCandidates)
    }

    HistSimResult(
      matching = iter.matching,
      histograms = Array.tabulate(nCandidates)(state.distribution),
      tau = state.tau.clone(),
      rounds = rounds,
      samples = state.totalSamples,
      deltaUpper = iter.deltaUpper,
    )
  }
}
