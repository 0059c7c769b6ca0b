package repro.core

/** Adaptive feature regularization (paper §3.2).
  *
  * Per-feature ridge `κ_j` is chosen so the Bhattacharyya coefficient
  * (distribution overlap) of the M/U marginals increases by the same
  * constant `κ'` for every feature (Equation 11): dominating features lose
  * relative influence while the influence *ordering* is preserved.
  */
object AdaptiveReg {

  private val VarFloor = 1e-12

  /** Bhattacharyya coefficient of two 1-D Gaussians (Equation 10). */
  def bc(varM: Double, varU: Double, muM: Double, muU: Double): Double = {
    val sM = math.max(varM, VarFloor)
    val sU = math.max(varU, VarFloor)
    val term1 = 0.25 * math.log(0.25 * (sM / sU + sU / sM + 2.0))
    val term2 = 0.25 * (muM - muU) * (muM - muU) / (sM + sU)
    math.exp(-term1 - term2)
  }

  /** Solve Equation (11): find κ_j >= 0 with
    * `bc(varM+κ, varU+κ, ...) - bc(varM, varU, ...) = κ'`.
    *
    * BC is monotone increasing in κ (adding the same ridge to both
    * variances pulls the variance ratio toward 1 and shrinks the
    * standardized mean gap), with limit 1 — so a bracketed bisection with a
    * Newton-style doubling bracket search is exact enough and unconditionally
    * robust, unlike a raw Newton iteration on a nearly-flat BC curve.
    * If the requested increase overshoots BC = 1 (already-overlapping
    * feature), the achievable half-gap is targeted instead; fully
    * degenerate features (BC = 1 already) get κ = 0.
    */
  def solveKappa(varM: Double, varU: Double, muM: Double, muU: Double,
                 kappaPrime: Double): Double = {
    if (kappaPrime <= 0.0) return 0.0
    val bc0    = bc(varM, varU, muM, muU)
    val target = if (bc0 + kappaPrime < 1.0) bc0 + kappaPrime
                 else bc0 + 0.5 * (1.0 - bc0)
    if (target <= bc0) return 0.0
    def f(k: Double): Double = bc(varM + k, varU + k, muM, muU) - target
    // bracket: f(0) < 0; double hi until f(hi) >= 0
    var hi = 1e-8
    var it = 0
    while (f(hi) < 0.0 && it < 80) { hi *= 2.0; it += 1 }
    if (f(hi) < 0.0) return hi // unreachable in practice
    var lo = 0.0
    it = 0
    while (it < 100 && (hi - lo) > 1e-12 * (1.0 + hi)) {
      val mid = 0.5 * (lo + hi)
      if (f(mid) < 0.0) lo = mid else hi = mid
      it += 1
    }
    0.5 * (lo + hi)
  }

  /** The per-feature regularization diagonal K = diag(κ_1..κ_d). */
  def adaptiveK(varM: Array[Double], varU: Array[Double],
                muM: Array[Double], muU: Array[Double],
                kappaPrime: Double): Array[Double] =
    Array.tabulate(varM.length) { j =>
      solveKappa(varM(j), varU(j), muM(j), muU(j), kappaPrime)
    }
}
