package repro.dp

/** Closed-form sensitivities from the paper.
  *
  *  - `Δ_R` (Appendix A.1, Eq 12): worst-case change of one cluster's
  *    approximated proportion when one individual is added/removed.
  *  - `Δ_Avg(R̂)` (Theorem 5.1): sensitivity of the per-provider average
  *    proportion shared during allocation.
  *  - `Δp` (Theorem 5.2): sensitivity of a cluster's sampling probability,
  *    the scoring function of the EM sampling step.
  */
object Sensitivity {

  /** `Δ_R = 1 − (1 − 1/S)^{|D^Q|}` (Eq 12). */
  def deltaR(S: Int, nDims: Int): Double = {
    require(S >= 1 && nDims >= 1)
    1.0 - math.pow(1.0 - 1.0 / S, nDims)
  }

  /** `Δ_Avg(R̂) = max(Δ_R / N^min, 1/(N^min + 1))` (Theorem 5.1). */
  def deltaAvgR(S: Int, nDims: Int, nMin: Int): Double = {
    require(nMin >= 1)
    math.max(deltaR(S, nDims) / nMin, 1.0 / (nMin + 1))
  }

  /** `Δp = 1 / (N^min (N^min + 1))` (Theorem 5.2). */
  def deltaP(nMin: Int): Double = {
    require(nMin >= 1)
    1.0 / (nMin.toDouble * (nMin + 1))
  }

  /** Global sensitivity of `N^Q` — adding/removing an individual changes the
    * covering-cluster count by at most 1 (Appendix A).
    */
  val deltaNQ: Double = 1.0
}
