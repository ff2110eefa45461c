package repro.engine

import scala.collection.mutable.ArrayBuffer
import repro.core.{Deviations, HistSimState, Iteration}
import repro.index.BitmapIndex

/** The five approaches of Section 5.2. */
sealed abstract class Approach(val name: String)
object Approach {
  /** Exact heap scan over all blocks — trivially satisfies both guarantees. */
  case object Scan extends Approach("Scan")
  /** Sequential reads, per-candidate fixed-width criterion max delta_i <= delta/|V_Z|. */
  case object SlowMatch extends Approach("SlowMatch")
  /** Sequential reads, HistSim criterion sum delta_i <= delta, no pruning. */
  case object ScanMatch extends Approach("ScanMatch")
  /** AnyActive pruning per individual block, no lookahead (cache-cold probes). */
  case object SyncMatch extends Approach("SyncMatch")
  /** Full FastMatch: AnyActive pruning with lookahead + async statistics. */
  case object FastMatch extends Approach("FastMatch")

  val all: Seq[Approach] = Seq(Scan, SlowMatch, ScanMatch, SyncMatch, FastMatch)
}

/** Inputs of one matching query, independent of approach. */
final case class MatchTask(
    vz: Int,
    vx: Int,
    k: Int,
    eps: Double,
    delta: Double,
    target: Array[Double],
)

/** Output of one matcher run.
  *
  * @param matching   estimated top-k candidate indices, tau-ascending
  * @param counts     final empirical histogram counts per candidate
  * @param tau        final estimated distances
  * @param deltaUpper final failure-probability bound (0 for Scan)
  * @param simTime    modeled wall time in tuple-units (see [[CostParams]])
  */
final case class RunResult(
    approach: String,
    matching: Array[Int],
    counts: Array[Array[Long]],
    tau: Array[Double],
    deltaUpper: Double,
    rounds: Int,
    cost: Cost,
    simTime: Double,
)

/** Drives the HistSim statistics engine against a block store — the
  * FastMatch system loop (Figure 5) and its degraded variants.
  *
  * The real system runs I/O, sampling and statistics in separate threads;
  * here the loop is single-threaded and the *wall-clock consequences* of
  * (a)synchrony are produced by the cost model:
  *
  *   Scan       wall = io
  *   Slow/Scan  wall = max(io, stats)                  (stats async)
  *   SyncMatch  wall = io + coldProbes + perBlockStall (all serial)
  *   FastMatch  wall = max(io + warmProbes, stats)     (stats async)
  */
object Matchers {

  def run(
      approach: Approach,
      task: MatchTask,
      reader: BlockReader,
      index: BitmapIndex,
      startBlock: Int,
      params: CostParams = CostParams(),
  ): RunResult = {
    val b = reader.numBlocks
    require(index.numBlocks == b, "index and reader disagree on block count")
    val state = new HistSimState(task.vz, task.target)
    val cost = new Cost

    // Sampling without replacement: once every block containing candidate
    // z has been read, z's histogram is exact and its deviation is 0.
    val blockTotal = Array.tabulate(task.vz)(index.blockCount)
    val blocksSeen = new Array[Int](task.vz)
    var z0 = 0
    while (z0 < task.vz) { if (blockTotal(z0) == 0) state.markExact(z0); z0 += 1 }

    var iter: Iteration = Deviations.iterate(state, task.k, task.eps, task.delta)
    cost.statsIters += 1
    var rounds = 0

    def terminated(it: Iteration): Boolean = approach match {
      case Approach.Scan      => false
      case Approach.SlowMatch => it.deltaMax <= task.delta / task.vz
      case _                  => it.deltaUpper <= task.delta
    }

    val readSet = new java.util.BitSet(b)
    var readCount = 0
    var pos = math.floorMod(startBlock, b)
    var totalScanned = 0L

    // stamp-based per-batch distinct-z and dirty-tau tracking
    val stamp = new Array[Int](task.vz)
    var stampVal = 0
    val dirty = new ArrayBuffer[Int]

    /** Next up-to-maxLen unread blocks in circular storage order. */
    def collectChunk(maxLen: Int): Array[Int] = {
      val buf = new ArrayBuffer[Int](maxLen)
      var scanned = 0
      while (buf.length < maxLen && scanned < b && readCount < b) {
        if (!readSet.get(pos)) buf += pos
        pos += 1; if (pos == b) pos = 0
        scanned += 1
      }
      totalScanned += scanned
      buf.toArray
    }

    def readBlocks(blocks: Array[Int]): Unit = {
      if (blocks.isEmpty) return
      val contents = reader.read(blocks)
      var i = 0
      while (i < blocks.length) {
        val block = blocks(i)
        readSet.set(block); readCount += 1
        cost.blocksRead += 1
        stampVal += 1
        val triples = contents(i)
        var j = 0
        while (j < triples.length) {
          val (z, x, c) = triples(j)
          state.add(z, x, c)
          cost.tuplesRead += c
          if (stamp(z) != stampVal) {
            stamp(z) = stampVal
            blocksSeen(z) += 1
            if (blocksSeen(z) == blockTotal(z)) state.markExact(z)
          }
          dirty += z
          j += 1
        }
        i += 1
      }
    }

    def runStats(): Unit = {
      if (dirty.nonEmpty) { state.refreshTau(dirty.distinct); dirty.clear() }
      iter = Deviations.iterate(state, task.k, task.eps, task.delta)
      cost.statsIters += 1
      rounds += 1
    }

    var done = terminated(iter)
    while (!done && readCount < b) {
      approach match {
        case Approach.Scan | Approach.ScanMatch | Approach.SlowMatch =>
          val chunk = collectChunk(params.roundBlocks)
          cost.blocksConsidered += chunk.length
          readBlocks(chunk)
          if (approach != Approach.Scan) runStats()

        case Approach.SyncMatch =>
          // per-block AnyActive with (simulation-granular) fresh deltas
          val chunk = collectChunk(params.syncStatsEvery)
          val toRead = new ArrayBuffer[Int](chunk.length)
          var i = 0
          while (i < chunk.length) {
            cost.blocksConsidered += 1
            if (Policies.syncAnyActive(index, iter.active, chunk(i), cost)) toRead += chunk(i)
            i += 1
          }
          readBlocks(toRead.toArray)
          runStats()

        case Approach.FastMatch =>
          val chunk = collectChunk(params.lookahead)
          cost.blocksConsidered += chunk.length
          val mark = Policies.lookaheadAnyActive(index, iter.active, chunk, cost)
          val toRead = new ArrayBuffer[Int](chunk.length)
          var i = 0
          while (i < chunk.length) { if (mark(i)) toRead += chunk(i); i += 1 }
          readBlocks(toRead.toArray)
          runStats()
      }
      done = terminated(iter)
      // Safety: a pruning pass that reads nothing can only happen once the
      // criterion holds; guard against pathological livelock regardless.
      require(totalScanned <= 300L * b, s"matcher did not converge after ${totalScanned / b} passes")
    }

    if (approach == Approach.Scan) runStats() // produce the exact ordering

    val vzRange = 0 until task.vz
    val wall = approach match {
      case Approach.Scan => cost.ioUnits(params)
      case Approach.SlowMatch | Approach.ScanMatch =>
        math.max(cost.ioUnits(params), cost.statsUnits(params, task.vz))
      case Approach.SyncMatch =>
        cost.ioUnits(params) + cost.coldProbeUnits(params) + cost.stallUnits(params, task.vz)
      case Approach.FastMatch =>
        math.max(cost.ioUnits(params) + cost.warmProbeUnits(params),
                 cost.statsUnits(params, task.vz))
    }

    RunResult(
      approach = approach.name,
      matching = iter.matching,
      counts = vzRange.map(z => state.counts(z).clone()).toArray,
      tau = state.tau.clone(),
      deltaUpper = if (approach == Approach.Scan) 0.0 else iter.deltaUpper,
      rounds = rounds,
      cost = cost,
      simTime = wall,
    )
  }
}
