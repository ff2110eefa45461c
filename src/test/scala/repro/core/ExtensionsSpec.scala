package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Tests for the Appendix A generalizations: distinct separation /
  * reconstruction tolerances (A.2.1), product support for multiple
  * grouping attributes (A.1.3), and automatic k selection (A.2.3).
  */
class ExtensionsSpec extends AnyFunSuite {

  private def stateWith(taus: Array[Double], ns: Array[Long], vx: Int = 4): HistSimState = {
    val s = new HistSimState(taus.length, Hist.uniform(vx))
    taus.indices.foreach { i => s.tau(i) = taus(i); s.n(i) = ns(i) }
    s
  }

  test("A.2.1: reconstruction tolerance caps matching candidates independently") {
    val s = stateWith(Array(0.05, 0.1, 0.8, 0.9), Array.fill(4)(1000L))
    val it = Deviations.iterate(s, k = 2, epsSep = 0.5, epsRec = 0.08, delta = 0.01)
    it.matching.foreach(i => assert(it.eps(i) <= 0.08 + 1e-12))
    // non-matching candidates are governed by the separation fence only
    val inM = it.matching.toSet
    (0 until 4).filterNot(inM).foreach(j => assert(it.eps(j) > 0.08))
  }

  test("A.2.1: epsSep controls the split fences") {
    val s = stateWith(Array(0.1, 0.2, 0.6, 0.8), Array.fill(4)(1000L))
    val tight = Deviations.iterate(s, 2, epsSep = 0.1, epsRec = 1.0, delta = 0.01)
    val loose = Deviations.iterate(s, 2, epsSep = 0.5, epsRec = 1.0, delta = 0.01)
    // looser separation tolerance widens every deviation allowance
    (0 until 4).foreach(i => assert(loose.eps(i) >= tight.eps(i) - 1e-12))
    assert(loose.deltaUpper <= tight.deltaUpper)
  }

  test("A.2.1: symmetric overload equals the eps1=eps2 case") {
    val s = stateWith(Array(0.1, 0.2, 0.6, 0.8), Array.fill(4)(500L))
    val a = Deviations.iterate(s, 2, 0.2, 0.01)
    val b = Deviations.iterate(s, 2, epsSep = 0.2, epsRec = 0.2, delta = 0.01)
    assert(a.eps.sameElements(b.eps))
    assert(a.deltaUpper == b.deltaUpper)
  }

  test("A.2.3: chooseK picks the k with the widest boundary gap") {
    // gaps: after 1st: 0.05, after 2nd: 0.4 (widest), after 3rd: 0.1
    val s = stateWith(Array(0.10, 0.15, 0.55, 0.65), Array.fill(4)(100L))
    assert(Deviations.chooseK(s, 1, 3) == 2)
    // restricting the range forces the best available
    assert(Deviations.chooseK(s, 3, 3) == 3)
  }

  test("A.2.3: chooseK clamps to the candidate count") {
    val s = stateWith(Array(0.1, 0.2), Array.fill(2)(100L))
    assert(Deviations.chooseK(s, 1, 10) == 2) // k = nz has an infinite 'gap'
    assert(Deviations.chooseK(s, 5, 9) == 2)
    intercept[IllegalArgumentException](Deviations.chooseK(s, 0, 2))
    intercept[IllegalArgumentException](Deviations.chooseK(s, 3, 2))
  }

  test("A.2.3: auto-chosen k certifies faster than a forced awkward k") {
    // 3-candidate cluster then a gap: k=3 separates easily, k=2 cannot
    val s = stateWith(Array(0.10, 0.11, 0.12, 0.90, 0.95), Array.fill(5)(2000L))
    val k = Deviations.chooseK(s, 2, 4)
    assert(k == 3)
    val auto = Deviations.iterate(s, k, 0.15, 0.01)
    val forced = Deviations.iterate(s, 2, 0.15, 0.01)
    assert(auto.deltaUpper < forced.deltaUpper)
  }

  test("A.1.3: product support multiplies cardinalities and saturates") {
    assert(Bounds.productSupport(Seq(24)) == 24)
    assert(Bounds.productSupport(Seq(24, 7)) == 168)
    assert(Bounds.productSupport(Seq(100000, 100000, 100000)) == Int.MaxValue)
    intercept[IllegalArgumentException](Bounds.productSupport(Seq.empty))
    intercept[IllegalArgumentException](Bounds.productSupport(Seq(0)))
  }

  test("A.1.3: overestimated support only loosens the bound (still correct)") {
    // eps under the product support dominates eps under the true joint support
    val n = 5000L; val delta = 0.01
    assert(Bounds.epsFor(n, delta, Bounds.productSupport(Seq(24, 7))) >=
           Bounds.epsFor(n, delta, 100)) // true joint support <= 168
  }
}
