package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import AdaptiveReg._

class AdaptiveRegSpec extends AnyFunSuite with repro.GenChecks {

  // ----- Bhattacharyya coefficient (Eq. 10) -----

  test("BC of identical distributions is 1") {
    assert(math.abs(bc(0.1, 0.1, 0.5, 0.5) - 1.0) < 1e-12)
  }
  test("BC of well-separated distributions is near 0") {
    assert(bc(1e-4, 1e-4, 0.0, 1.0) < 1e-6)
  }
  test("BC decreases with mean separation") {
    val base = bc(0.05, 0.05, 0.5, 0.5)
    val far  = bc(0.05, 0.05, 0.2, 0.8)
    assert(far < base)
  }
  test("BC penalizes variance mismatch even with equal means") {
    assert(bc(0.01, 0.5, 0.5, 0.5) < 1.0 - 1e-3)
  }
  test("BC is symmetric in the two components") {
    assert(math.abs(bc(0.02, 0.3, 0.1, 0.9) - bc(0.3, 0.02, 0.9, 0.1)) < 1e-12)
  }
  test("BC handles zero variance without NaN/Inf") {
    val v = bc(0.0, 0.2, 0.0, 1.0)
    assert(!v.isNaN && !v.isInfinite && v >= 0.0 && v <= 1.0)
  }
  test("BC known value: unit variances, means one sigma apart") {
    // term1 = 0.25*ln(1) = 0; term2 = 0.25 * 1 / 2 = 0.125
    assert(math.abs(bc(1.0, 1.0, 0.0, 1.0) - math.exp(-0.125)) < 1e-12)
  }
  test("BC in [0,1] (property)") {
    val g = Gen.zip(Gen.choose(0.0, 1.0), Gen.choose(0.0, 1.0),
                    Gen.choose(0.0, 1.0), Gen.choose(0.0, 1.0))
    forAllG(g) { case (vM, vU, mM, mU) =>
      val v = bc(vM, vU, mM, mU)
      assert(v >= 0.0 && v <= 1.0 + 1e-12)
    }
  }
  test("BC is monotone increasing in a shared ridge (property)") {
    val g = Gen.zip(Gen.choose(1e-6, 0.3), Gen.choose(1e-6, 0.3),
                    Gen.choose(0.0, 1.0), Gen.choose(0.0, 1.0))
    forAllG(g) { case (vM, vU, mM, mU) =>
      val b0 = bc(vM, vU, mM, mU)
      val b1 = bc(vM + 0.05, vU + 0.05, mM, mU)
      assert(b1 >= b0 - 1e-12)
    }
  }

  // ----- Equation 11 solver -----

  test("solveKappa achieves the requested BC increase") {
    val (vM, vU, mM, mU) = (0.001, 0.04, 0.9, 0.3)
    val k   = solveKappa(vM, vU, mM, mU, 0.01)
    val bc0 = bc(vM, vU, mM, mU)
    val bc1 = bc(vM + k, vU + k, mM, mU)
    assert(math.abs((bc1 - bc0) - 0.01) < 1e-6)
  }
  test("solveKappa on a degenerate zero-variance feature") {
    val k = solveKappa(0.0, 0.0, 1.0, 0.0, 0.01)
    assert(k > 0.0)
    val bc1 = bc(k, k, 1.0, 0.0)
    assert(math.abs(bc1 - 0.01) < 1e-5) // BC0 = 0 for the degenerate feature
  }
  test("solveKappa returns 0 for kappaPrime = 0") {
    assert(solveKappa(0.01, 0.02, 0.9, 0.1, 0.0) == 0.0)
  }
  test("solveKappa returns 0 when distributions already fully overlap") {
    assert(solveKappa(0.1, 0.1, 0.5, 0.5, 0.01) == 0.0)
  }
  test("solveKappa targets the half-gap when the increase would overshoot 1") {
    val (vM, vU, mM, mU) = (0.2, 0.2, 0.5, 0.52) // BC0 close to 1
    val bc0 = bc(vM, vU, mM, mU)
    val k   = solveKappa(vM, vU, mM, mU, 0.9)
    val bc1 = bc(vM + k, vU + k, mM, mU)
    assert(bc1 <= 1.0 && bc1 >= bc0)
  }
  test("more influential features stay more influential after regularization") {
    // f3: overlap 0.001, f4: overlap ~0.3 (the paper's §3.2 scenario)
    val k3  = solveKappa(1e-4, 1e-4, 0.0, 1.0, 0.05)
    val k4  = solveKappa(0.02, 0.02, 0.3, 0.7, 0.05)
    val bc3 = bc(1e-4 + k3, 1e-4 + k3, 0.0, 1.0)
    val bc4 = bc(0.02 + k4, 0.02 + k4, 0.3, 0.7)
    assert(bc3 < bc4, "dominating feature must remain more influential")
  }
  test("adaptiveK vectorizes the per-feature solve") {
    val k = adaptiveK(Array(0.001, 0.04), Array(0.002, 0.05),
                      Array(0.9, 0.8), Array(0.1, 0.3), 0.01)
    assert(k.length == 2)
    assert(k.forall(_ >= 0.0))
  }
  test("solveKappa solution is stable across magnitudes (property)") {
    val g = Gen.zip(Gen.choose(1e-8, 0.2), Gen.choose(1e-8, 0.2),
                    Gen.choose(0.0, 0.4), Gen.choose(0.6, 1.0))
    forAllG(g) { case (vM, vU, mM, mU) =>
      val k = solveKappa(vM, vU, mM, mU, 0.01)
      assert(k >= 0.0 && !k.isNaN && !k.isInfinite)
      val delta = bc(vM + k, vU + k, mM, mU) - bc(vM, vU, mM, mU)
      assert(delta <= 0.011, s"BC increase $delta exceeds target")
    }
  }
}
