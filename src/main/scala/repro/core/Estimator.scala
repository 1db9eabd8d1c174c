package repro.core

/** Hansen–Hurwitz estimator for unequal-probability cluster sampling
  * (paper Eq 3 / Eq 8, [Lohr 2009]).
  *
  * Given sampled clusters with per-cluster query results `Q(C_i)` and
  * sampling probabilities `p_i` (Eq 1), the provider-local total is
  * estimated as `E = (1/s) Σ Q(C_i)/p_i`.
  */
object Estimator {
  /** Floor applied to probabilities so a degenerate `p=0` cluster (possible
    * only through the uniform fallback) cannot produce an infinite term.
    */
  val MinProbability: Double = 1e-12

  /** `E(Q, C_S^Q)` over `(Q(C_i), p_i)` pairs. Empty sample estimates 0. */
  def hansenHurwitz(sampled: Seq[(Double, Double)]): Double =
    if (sampled.isEmpty) 0.0
    else sampled.iterator.map { case (q, p) => q / math.max(p, MinProbability) }.sum / sampled.size
}
