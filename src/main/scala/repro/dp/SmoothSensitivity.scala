package repro.dp

/** Smooth sensitivity of the Hansen–Hurwitz estimator term
  * `𝔼(C,Q,p) = Q(C)/p` (paper §5.3.3, Appendix B).
  *
  * The global sensitivity of `𝔼` is unbounded (Theorem 5.3), so noise is
  * calibrated with the smooth-sensitivity framework [Nissim et al. 2007]:
  * `S_LS = max_k e^{−βk}·LS^k` with `β = ε^E / (2·ln(2/δ))`.
  *
  * Of the four neighbouring scenarios (Appendix B.2) only two can dominate:
  *
  *  - scenario 1 (another cluster gained a row; `p` shrinks):
  *    `LS^k = k · Q(C)·Δ_R / R`
  *  - scenario 4 (this cluster's Measure grew by 1; `Q(C)` grows):
  *    `LS^k = k / p`
  *
  * and Theorem 5.4 picks the dominant one without computing both:
  * scenario 1 wins iff `Q(C) > ΣR / Δ_R`.
  */
object SmoothSensitivity {

  /** Floor for `R` and `p` so an all-zero-proportion cluster (uniform
    * fallback) yields a large-but-finite sensitivity instead of ∞.
    */
  private val Tiny = 1e-12

  /** `β = ε / (2·ln(2/δ))` (Eq 10). */
  def beta(eps: Double, delta: Double): Double = {
    require(delta > 0 && delta < 1, s"delta must be in (0,1), got $delta")
    eps / (2.0 * math.log(2.0 / delta))
  }

  /** Iteration bound `k ≤ 1/(1−e^{−β}) + 1` (Appendix B.3): past it,
    * `e^{−βk}·k` strictly decays, so the max has been seen.
    */
  def kMax(b: Double): Int = {
    require(b > 0, s"beta must be positive, got $b")
    math.ceil(1.0 / (1.0 - math.exp(-b))).toInt + 1
  }

  /** Per-step slope `c` of the dominant linear distance `LS^k = k·c`
    * (Theorem 5.4 + Eq 26).
    *
    * @param qC    per-cluster query result `Q(C)`
    * @param r     the cluster's approximated proportion `R`
    * @param p     the cluster's sampling probability (Eq 1)
    * @param sumR  `Σ_{R∈R̂} R` over the covering clusters
    * @param dR    `Δ_R` (Eq 12)
    */
  def dominantSlope(qC: Double, r: Double, p: Double, sumR: Double, dR: Double): Double =
    if (qC > sumR / dR) qC * dR / math.max(r, Tiny) // scenario 1
    else 1.0 / math.max(p, Tiny)                    // scenario 4

  /** `S_LS = max_k e^{−βk}·k·slope` (Eq 10).
    *
    * For the paper's linear distances `LS^k = k·slope`, the function
    * `k·e^{−βk}` is unimodal with its continuous maximum at `k* = 1/β`, so
    * the integer maximum sits at `⌊1/β⌋` or `⌈1/β⌉` — evaluated in closed
    * form rather than looping to the Appendix-B.3 bound (under tiny
    * attack-regime budgets `1/β` reaches 10^5+, and a loop per sampled
    * cluster per query would dominate the runtime).
    */
  def smooth(slope: Double, eps: Double, delta: Double): Double = {
    if (slope == 0.0) return 0.0
    val b = beta(eps, delta)
    val kStar = 1.0 / b // 0 when eps = ∞ (noiseless limit): max sits at k=1
    val candidates = Seq(math.floor(kStar).toLong, math.ceil(kStar).toLong, 1L).filter(_ >= 1L)
    candidates.map(k => math.exp(-b * k) * k * slope).max
  }

  /** Smooth sensitivity of one sampled cluster's estimator term. */
  def forCluster(qC: Double, r: Double, p: Double, sumR: Double, dR: Double,
                 eps: Double, delta: Double): Double =
    smooth(dominantSlope(qC, r, p, sumR, dR), eps, delta)

  /** `Δ_E = (1/s) Σ Δ_𝔼` (Eq 9) — the estimator averages `s` terms, so its
    * smooth bound is the average of the per-cluster bounds (Algorithm 3
    * line 6).
    */
  def forEstimator(perCluster: Seq[Double]): Double =
    if (perCluster.isEmpty) 0.0 else perCluster.sum / perCluster.size
}
