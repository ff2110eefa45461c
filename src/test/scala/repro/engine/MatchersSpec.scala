package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Hist
import repro.engine.GroundTruth.Truth
import repro.index.BitmapIndex

/** Driver-side matcher tests against an in-memory block store with known
  * ground truth (no Spark needed — the Spark paths are covered by
  * EndToEndSpec).
  */
class MatchersSpec extends AnyFunSuite {

  /** In-memory population: candidate z has freq(z) tuples drawn from
    * dists(z), scattered uniformly over blocks.
    */
  private def toyStore(freq: Array[Int], dists: Array[Array[Double]],
                       tuplesPerBlock: Int, seed: Long): (BlockReader, BitmapIndex, Truth, Int) = {
    val vz = freq.length; val vx = dists(0).length
    val rows = freq.map(_.toLong).sum
    val b = math.max(1, (rows / tuplesPerBlock).toInt)
    val rng = new java.util.Random(seed)
    val cdfs = dists.map { d =>
      val out = new Array[Double](d.length); var acc = 0.0
      for (i <- d.indices) { acc += d(i); out(i) = acc }
      out(d.length - 1) = 1.0; out
    }
    val perBlock = Array.fill(b)(scala.collection.mutable.Map.empty[(Int, Int), Int])
    val hists = Array.fill(vz)(new Array[Long](vx))
    for (z <- 0 until vz; _ <- 0 until freq(z)) {
      val u = rng.nextDouble(); var x = 0
      while (cdfs(z)(x) < u) x += 1
      val blk = rng.nextInt(b)
      perBlock(blk)((z, x)) = perBlock(blk).getOrElse((z, x), 0) + 1
      hists(z)(x) += 1
    }
    val reader = new BlockReader {
      override val numBlocks: Int = b
      override def read(blocks: Array[Int]): Array[Array[(Int, Int, Int)]] =
        blocks.map(blk => perBlock(blk).iterator.map { case ((z, x), c) => (z, x, c) }.toArray)
    }
    val index = BitmapIndex.fromBlockTriples(
      perBlock.iterator.zipWithIndex.flatMap { case (m, blk) =>
        m.keysIterator.map { case (z, _) => (blk, z, 1) }
      }, vz, b)
    val target = Hist.normalize(hists(0))
    val tau = hists.map(h => Hist.dist(h, target))
    val k = 2
    val topK = Array.range(0, vz).sortBy(tau).take(k)
    (reader, index, Truth(target, hists, tau, topK), b)
  }

  /** 8 candidates: 0,1 close together (top-2), 2..5 far, 6,7 rare+far. */
  private def standardSetup(seed: Long = 1) = {
    val freq = Array(4000, 4000, 3000, 3000, 3000, 3000, 150, 150)
    val base = Array(0.4, 0.3, 0.2, 0.1)
    def shift(i: Int) = {
      val p = base.clone()
      val j = i % 4; val l = (i + 1) % 4
      p(j) += 0.3 * math.min(1.0, i / 3.0); p(l) -= math.min(p(l) - 0.01, 0.3 * math.min(1.0, i / 3.0))
      Hist.normalize(p)
    }
    val dists = Array(
      base, Hist.normalize(Array(0.41, 0.3, 0.19, 0.1)),
      shift(3), shift(4), shift(5), shift(6), shift(7), shift(8))
    toyStore(freq, dists, tuplesPerBlock = 32, seed = seed)
  }

  private def task(truth: Truth, eps: Double = 0.25, delta: Double = 0.05) =
    MatchTask(truth.hists.length, truth.target.length, 2, eps, delta, truth.target)

  test("Scan reads everything and returns the exact top-k") {
    val (reader, index, truth, b) = standardSetup()
    val res = Matchers.run(Approach.Scan, task(truth), reader, index, startBlock = 3)
    assert(res.cost.blocksRead == b)
    assert(res.cost.tuplesRead == truth.hists.map(_.sum).sum)
    assert(res.matching.sameElements(truth.topK))
    assert(res.deltaUpper == 0.0)
    // Scan's counts are the exact histograms
    truth.hists.indices.foreach(z => assert(res.counts(z).sameElements(truth.hists(z))))
  }

  test("every approximate approach satisfies both guarantees") {
    val (reader, index, truth, _) = standardSetup()
    val t = task(truth)
    for (app <- Approach.all; start <- Seq(0, 17, 101)) {
      val res = Matchers.run(app, t, reader, index, start)
      assert(Metrics.separationHolds(res.matching, truth, t.eps), s"$app separation")
      assert(Metrics.reconstructionHolds(res.matching, res.counts, truth, t.eps),
        s"$app reconstruction")
    }
  }

  test("sum-criterion approaches terminate with deltaUpper <= delta") {
    val (reader, index, truth, _) = standardSetup()
    val t = task(truth)
    for (app <- Seq(Approach.ScanMatch, Approach.SyncMatch, Approach.FastMatch)) {
      val res = Matchers.run(app, t, reader, index, 0)
      assert(res.deltaUpper <= t.delta, s"$app deltaUpper=${res.deltaUpper}")
    }
  }

  test("approximate approaches read fewer tuples than Scan on an easy query") {
    val (reader, index, truth, _) = standardSetup()
    val total = truth.hists.map(_.sum).sum
    val t = task(truth, eps = 0.4, delta = 0.05)
    for (app <- Seq(Approach.ScanMatch, Approach.FastMatch)) {
      val res = Matchers.run(app, t, reader, index, 0)
      assert(res.cost.tuplesRead < total, s"$app read everything")
    }
  }

  test("SlowMatch never reads fewer tuples than ScanMatch (same start)") {
    val (reader, index, truth, _) = standardSetup()
    val t = task(truth)
    for (start <- Seq(0, 50, 200)) {
      val slow = Matchers.run(Approach.SlowMatch, t, reader, index, start)
      val scan = Matchers.run(Approach.ScanMatch, t, reader, index, start)
      assert(slow.cost.tuplesRead >= scan.cost.tuplesRead, s"start=$start")
    }
  }

  test("FastMatch prunes blocks once only rare candidates remain active") {
    val (reader, index, truth, b) = standardSetup()
    // small eps: the rare candidates 6,7 must be resolved by exhaustion,
    // so FastMatch should skip blocks lacking them in the endgame
    val t = task(truth, eps = 0.12, delta = 0.01)
    val fast = Matchers.run(Approach.FastMatch, t, reader, index, 0)
    val scan = Matchers.run(Approach.ScanMatch, t, reader, index, 0)
    assert(fast.cost.blocksRead <= scan.cost.blocksRead)
    assert(fast.cost.blocksConsidered <= 300L * b)
  }

  test("matcher is deterministic given (reader, index, start)") {
    val (reader, index, truth, _) = standardSetup()
    val t = task(truth)
    val a = Matchers.run(Approach.FastMatch, t, reader, index, 42)
    val bRes = Matchers.run(Approach.FastMatch, t, reader, index, 42)
    assert(a.matching.sameElements(bRes.matching))
    assert(a.simTime == bRes.simTime)
    assert(a.cost.tuplesRead == bRes.cost.tuplesRead)
  }

  test("start block is normalized modulo the block count") {
    val (reader, index, truth, b) = standardSetup()
    val t = task(truth)
    val a = Matchers.run(Approach.ScanMatch, t, reader, index, 5)
    val c = Matchers.run(Approach.ScanMatch, t, reader, index, 5 + b)
    assert(a.matching.sameElements(c.matching) && a.cost.tuplesRead == c.cost.tuplesRead)
    val d = Matchers.run(Approach.ScanMatch, t, reader, index, -1) // floorMod
    assert(d.matching.sameElements(truth.topK) || d.matching.length == 2)
  }

  test("unsatisfiably tight eps degrades to a full (exact) pass") {
    val (reader, index, truth, b) = standardSetup()
    val t = task(truth, eps = 1e-6, delta = 1e-9)
    for (app <- Seq(Approach.SlowMatch, Approach.ScanMatch, Approach.FastMatch)) {
      val res = Matchers.run(app, t, reader, index, 7)
      assert(res.cost.blocksRead == b, s"$app must exhaust the store")
      assert(res.matching.sameElements(truth.topK), s"$app must be exact after full pass")
      assert(res.deltaUpper == 0.0)
    }
  }

  test("empirical counts never exceed the true histograms") {
    val (reader, index, truth, _) = standardSetup()
    val res = Matchers.run(Approach.FastMatch, task(truth), reader, index, 3)
    for (z <- truth.hists.indices; x <- truth.hists(z).indices)
      assert(res.counts(z)(x) <= truth.hists(z)(x))
  }

  test("SyncMatch accrues cold probes and stall; FastMatch accrues warm probes") {
    val (reader, index, truth, _) = standardSetup()
    val t = task(truth)
    val p = CostParams()
    val sync = Matchers.run(Approach.SyncMatch, t, reader, index, 0, p)
    val fast = Matchers.run(Approach.FastMatch, t, reader, index, 0, p)
    assert(sync.cost.probesCold > 0 && sync.cost.probesWarm == 0)
    assert(fast.cost.probesCold == 0)
    assert(fast.cost.lineMisses > 0)
    // wall formulas
    assert(sync.simTime >=
      sync.cost.ioUnits(p) + sync.cost.coldProbeUnits(p))
    assert(fast.simTime >= fast.cost.ioUnits(p))
  }

  test("wall formula: Scan simTime equals pure IO units") {
    val (reader, index, truth, _) = standardSetup()
    val p = CostParams()
    val res = Matchers.run(Approach.Scan, task(truth), reader, index, 0, p)
    assert(res.simTime == res.cost.ioUnits(p))
  }

  test("rounds are counted and bounded by considered blocks") {
    val (reader, index, truth, _) = standardSetup()
    val res = Matchers.run(Approach.FastMatch, task(truth), reader, index, 0)
    assert(res.rounds >= 1)
    assert(res.rounds <= res.cost.blocksConsidered + 1)
  }

  test("candidate absent from the data is handled (exact-empty)") {
    // add a 9th candidate with zero tuples by widening vz
    val (reader, index, truth, _) = standardSetup()
    val vz = truth.hists.length + 1
    val index2 = {
      val bitmaps = java.util.Arrays.copyOf(index.bitmaps, vz)
      bitmaps(vz - 1) = new java.util.BitSet(reader.numBlocks)
      new BitmapIndex(bitmaps, reader.numBlocks)
    }
    val t = MatchTask(vz, truth.target.length, 2, 0.25, 0.05, truth.target)
    val res = Matchers.run(Approach.FastMatch, t, reader, index2, 0)
    // the empty candidate has distance 1 from the target and exactness
    assert(!res.matching.contains(vz - 1))
    assert(res.deltaUpper <= 0.05)
  }
}
