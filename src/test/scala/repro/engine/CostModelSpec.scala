package repro.engine

import org.scalatest.funsuite.AnyFunSuite

class CostModelSpec extends AnyFunSuite {

  test("default parameters encode the paper's cost asymmetries") {
    val p = CostParams()
    // a cold probe costs more than a tuple; a warm probe is ~a line's
    // amortization cheaper (512-bit lookahead per cache line)
    assert(p.tMissProbe > p.tTuple)
    assert(p.tHitProbe * 64 <= p.tMissProbe + 1e-12)
    assert(p.lookahead == 512) // the paper's default
  }

  test("ioUnits scales with tuples read") {
    val c = new Cost
    c.tuplesRead = 1000
    assert(c.ioUnits(CostParams()) == 1000.0)
    assert(c.ioUnits(CostParams(tTuple = 2.0)) == 2000.0)
  }

  test("cold probe units price every probe as a miss") {
    val c = new Cost
    c.probesCold = 100
    val p = CostParams(tMissProbe = 3.0)
    assert(c.coldProbeUnits(p) == 300.0)
  }

  test("warm probe units combine hits and per-line misses") {
    val c = new Cost
    c.probesWarm = 511; c.lineMisses = 1
    val p = CostParams(tMissProbe = 1.5, tHitProbe = 1.5 / 64)
    assert(math.abs(c.warmProbeUnits(p) - (511 * 1.5 / 64 + 1.5)) < 1e-9)
    // a full lookahead chunk under warm pricing is far cheaper than cold
    val cold = new Cost
    cold.probesCold = 512
    assert(c.warmProbeUnits(p) < cold.coldProbeUnits(p) / 10)
  }

  test("stats units scale with iterations and candidate count") {
    val c = new Cost
    c.statsIters = 10
    val p = CostParams(tStatOpPerCand = 0.1)
    assert(c.statsUnits(p, vz = 2000) == 10 * 2000 * 0.1)
  }

  test("stall units scale with blocks considered and |V_Z|") {
    val c = new Cost
    c.blocksConsidered = 100
    val p = CostParams(tStatOpPerCand = 0.1, syncStallFactor = 0.5)
    assert(c.stallUnits(p, vz = 200) == 100 * 0.5 * 0.1 * 200)
  }

  test("fresh Cost is all zeros") {
    val c = new Cost
    val p = CostParams()
    assert(c.ioUnits(p) == 0 && c.coldProbeUnits(p) == 0 &&
      c.warmProbeUnits(p) == 0 && c.statsUnits(p, 10) == 0 && c.stallUnits(p, 10) == 0)
  }
}
