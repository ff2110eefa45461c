package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable.ArrayBuffer

/** End-to-end tests of the abstract Algorithm 1 loop against in-memory
  * multinomial populations with known ground truth.
  */
class HistSimLoopSpec extends AnyFunSuite {

  /** Infinite-population sampler: each round draws `roundSize` tuples,
    * candidates chosen by `weights`, groups by the candidate's true
    * distribution. Optionally restricts draws to active candidates.
    */
  private final class MultinomialSampler(
      dists: Array[Array[Double]],
      weights: Array[Double],
      roundSize: Int,
      seed: Long,
      onlyActive: Boolean = false,
  ) extends Sampler {
    private val rng = new java.util.Random(seed)
    private val wCdf = cdf(weights)
    private val xCdfs = dists.map(cdf)
    var totalDrawn = 0L

    private def cdf(w: Array[Double]): Array[Double] = {
      val t = w.sum; val out = new Array[Double](w.length)
      var acc = 0.0
      for (i <- w.indices) { acc += w(i) / t; out(i) = acc }
      out(w.length - 1) = 1.0; out
    }
    private def draw(c: Array[Double]): Int = {
      val u = rng.nextDouble(); var i = 0
      while (c(i) < u) i += 1
      i
    }

    override def nextRound(active: Array[Boolean]): Array[(Int, Int, Int)] = {
      val buf = new ArrayBuffer[(Int, Int, Int)]
      var drawn = 0
      var attempts = 0
      while (drawn < roundSize && attempts < roundSize * 50) {
        val z = draw(wCdf)
        attempts += 1
        if (!onlyActive || active(z)) {
          buf += ((z, draw(xCdfs(z)), 1))
          drawn += 1
        }
      }
      totalDrawn += drawn
      buf.toArray
    }
    override def exhausted(): Set[Int] = Set.empty
  }

  /** A toy population: candidates 0 and 1 close to the target, the rest
    * progressively far.
    */
  private def toyDists(vz: Int, vx: Int): (Array[Double], Array[Array[Double]]) = {
    val target = Hist.uniform(vx)
    val dists = Array.tabulate(vz) { z =>
      if (z < 2) Hist.normalize(Array.tabulate(vx)(x => 1.0 + (if (x == z) 0.05 else 0.0)))
      else {
        val bump = 0.5 + 0.5 * z
        Hist.normalize(Array.tabulate(vx)(x => if (x == z % vx) bump * vx else 1.0))
      }
    }
    (target, dists)
  }

  test("HistSim finds the true top-2 on a well-separated population") {
    val (target, dists) = toyDists(vz = 8, vx = 6)
    val sampler = new MultinomialSampler(dists, Array.fill(8)(1.0), 500, seed = 1)
    val res = HistSim.run(8, target, sampler, k = 2, eps = 0.3, delta = 0.05)
    assert(res.matching.toSet == Set(0, 1))
    assert(res.deltaUpper <= 0.05)
  }

  test("returned histograms satisfy reconstruction against true distributions") {
    val (target, dists) = toyDists(vz = 8, vx = 6)
    val sampler = new MultinomialSampler(dists, Array.fill(8)(1.0), 500, seed = 2)
    val eps = 0.3
    val res = HistSim.run(8, target, sampler, k = 2, eps = eps, delta = 0.05)
    res.matching.foreach { i =>
      assert(Hist.l1(res.histograms(i), dists(i)) < eps,
        s"reconstruction failed for candidate $i")
    }
  }

  test("separation: estimated taus are close to true taus at termination") {
    val (target, dists) = toyDists(vz = 8, vx = 6)
    val trueTau = dists.map(d => Hist.l1(d, target))
    val sampler = new MultinomialSampler(dists, Array.fill(8)(1.0), 500, seed = 3)
    val eps = 0.3
    val res = HistSim.run(8, target, sampler, k = 2, eps = eps, delta = 0.05)
    res.matching.foreach(i => assert(math.abs(res.tau(i) - trueTau(i)) < eps))
  }

  test("MaxDelta (SlowMatch) needs at least as many samples as SumDelta") {
    val (target, dists) = toyDists(vz = 10, vx = 6)
    def samplesWith(c: Criterion, seed: Long): Long = {
      val s = new MultinomialSampler(dists, Array.fill(10)(1.0), 200, seed)
      HistSim.run(10, target, s, k = 2, eps = 0.25, delta = 0.05, criterion = c).samples
    }
    // average over seeds to damp round-granularity noise
    val sum = (1L to 5L).map(samplesWith(Criterion.SumDelta, _)).sum
    val max = (1L to 5L).map(samplesWith(Criterion.MaxDelta, _)).sum
    assert(max >= sum, s"MaxDelta used $max total samples < SumDelta's $sum")
  }

  test("active-only sampling still returns correct results") {
    val (target, dists) = toyDists(vz = 8, vx = 6)
    val sampler = new MultinomialSampler(dists, Array.fill(8)(1.0), 500, seed = 4, onlyActive = true)
    val res = HistSim.run(8, target, sampler, k = 2, eps = 0.3, delta = 0.05)
    assert(res.matching.toSet == Set(0, 1))
  }

  test("skewed candidate weights do not break correctness") {
    val (target, dists) = toyDists(vz = 8, vx = 6)
    val weights = Array.tabulate(8)(z => if (z < 2) 0.3 else 3.0) // top-k under-represented
    val sampler = new MultinomialSampler(dists, weights, 800, seed = 5)
    val res = HistSim.run(8, target, sampler, k = 2, eps = 0.3, delta = 0.05)
    assert(res.matching.toSet == Set(0, 1))
  }

  test("finite population: exhaustion forces exactness and termination") {
    // sampler with a tiny finite population; eps far too small to ever be
    // met by sampling alone
    val vx = 4
    val target = Hist.uniform(vx)
    val pop: Array[Array[Int]] = Array(
      Array(10, 10, 10, 10), // candidate 0: exactly uniform
      Array(30, 5, 3, 2),    // candidate 1: far
    )
    val sampler = new Sampler {
      private var delivered = false
      override def nextRound(active: Array[Boolean]): Array[(Int, Int, Int)] = {
        if (delivered) Array.empty
        else {
          delivered = true
          (for (z <- pop.indices; x <- 0 until vx if pop(z)(x) > 0)
            yield (z, x, pop(z)(x))).toArray
        }
      }
      override def exhausted(): Set[Int] = if (delivered) Set(0, 1) else Set.empty
    }
    val res = HistSim.run(2, target, sampler, k = 1, eps = 0.001, delta = 0.001)
    assert(res.matching.sameElements(Array(0)))
    assert(res.deltaUpper == 0.0)
  }

  test("immediate termination when the criterion trivially holds") {
    // k >= vz and a single exact candidate
    val target = Hist.uniform(2)
    val sampler = new Sampler {
      override def nextRound(active: Array[Boolean]): Array[(Int, Int, Int)] = Array.empty
      override def exhausted(): Set[Int] = Set.empty
    }
    // delta close to 1 with vz=1, zero samples: delta_i = 1 > 0.99 — must
    // not terminate instantly; after the empty round it stops safely.
    val res = HistSim.run(1, target, sampler, k = 1, eps = 1.9, delta = 0.99, maxRounds = 5)
    assert(res.rounds <= 5)
  }

  test("maxRounds caps the loop") {
    val (target, dists) = toyDists(vz = 8, vx = 6)
    val sampler = new MultinomialSampler(dists, Array.fill(8)(1.0), 10, seed = 6)
    val res = HistSim.run(8, target, sampler, k = 2, eps = 0.01, delta = 1e-6, maxRounds = 3)
    assert(res.rounds == 3)
  }
}
