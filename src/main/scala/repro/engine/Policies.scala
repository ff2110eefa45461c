package repro.engine

import repro.index.BitmapIndex

/** Block-selection policies (Section 4.2, Challenges 2 and 3).
  *
  * Both AnyActive variants mark a block :read iff it contains at least
  * one tuple of an active candidate; they differ only in probing pattern,
  * which the cost model prices differently:
  *
  *  - [[syncAnyActive]] — Algorithm 2: per single block, candidates
  *    probed in order until the first hit. Every probe is cache-cold.
  *  - [[lookaheadAnyActive]] — Algorithm 3: candidate-major over a chunk
  *    of `lookahead` consecutive blocks; each (candidate, chunk) pass
  *    touches one cache line of the candidate's bitmap (one miss, rest
  *    hits) and skips already-marked blocks.
  */
object Policies {

  /** Algorithm 2 for one block. Returns whether to read; accounts cold
    * probes into `cost`.
    */
  def syncAnyActive(index: BitmapIndex, active: Array[Boolean], block: Int, cost: Cost): Boolean = {
    var z = 0
    while (z < active.length) {
      if (active(z)) {
        cost.probesCold += 1
        if (index.contains(z, block)) return true
      }
      z += 1
    }
    false
  }

  /** Algorithm 3 over a chunk of blocks. Returns the :read marks aligned
    * with `blocks`; accounts warm probes plus one line miss per examined
    * (candidate, chunk) into `cost`.
    */
  def lookaheadAnyActive(index: BitmapIndex, active: Array[Boolean], blocks: Array[Int],
                         cost: Cost): Array[Boolean] = {
    val mark = new Array[Boolean](blocks.length)
    var remaining = blocks.length
    var z = 0
    while (z < active.length && remaining > 0) {
      if (active(z)) {
        cost.lineMisses += 1
        var i = 0
        var probedThisCand = 0L
        while (i < blocks.length && remaining > 0) {
          if (!mark(i)) {
            probedThisCand += 1
            if (index.contains(z, blocks(i))) { mark(i) = true; remaining -= 1 }
          }
          i += 1
        }
        // the first probe of the chunk is the line miss already counted
        cost.probesWarm += math.max(0L, probedThisCand - 1)
      }
      z += 1
    }
    mark
  }
}
