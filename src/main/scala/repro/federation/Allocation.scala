package repro.federation

/** Noisy per-provider summary shared during the allocation phase
  * (paper §5.3.1): `Ñ^Q` covering clusters and `Ãvg(R̂)` average proportion,
  * both already Laplace-perturbed by the provider.
  */
final case class ProviderSummary(providerId: Int, noisyN: Double, noisyAvgR: Double)

/** The aggregator's allocation optimization (Eq 6):
  *
  *   maximize Σ Ãvg(R̂)_i · s_i
  *   s.t.     Σ s_i = sr · Σ Ñ_i^Q,   1 ≤ s_i ≤ Ñ_i^Q
  *
  * With a single equality constraint and box bounds this LP is solved
  * exactly by a greedy fill: give every provider its floor of 1, then pour
  * the remaining budget into providers in decreasing `Ãvg(R̂)` order. (The
  * paper used OrTools; greedy is provably optimal here — tested against
  * brute force.)
  */
object Allocation {

  /** Integer sample sizes per provider id. Noisy inputs are clamped:
    * `Ñ_i` to at least 1 (Laplace noise can push it ≤ 0), and the total to
    * `[|S|, Σ Ñ_i]` so every provider gets at least its floor.
    */
  def allocate(summaries: Seq[ProviderSummary], sr: Double): Map[Int, Int] = {
    require(summaries.nonEmpty, "no providers to allocate to")
    require(sr > 0 && sr < 1, s"sampling rate must be in (0,1), got $sr")
    val caps = summaries.map(s => s.providerId -> math.max(1L, math.round(s.noisyN))).toMap
    val capTotal = caps.values.sum
    val want = math.round(sr * capTotal.toDouble)
    val total = math.min(capTotal, math.max(summaries.size.toLong, want))

    val alloc = scala.collection.mutable.Map(summaries.map(s => s.providerId -> 1L): _*)
    var remaining = total - summaries.size
    for (s <- summaries.sortBy(-_.noisyAvgR) if remaining > 0) {
      val grant = math.min(caps(s.providerId) - 1L, remaining)
      alloc(s.providerId) += grant
      remaining -= grant
    }
    alloc.map { case (k, v) => k -> v.toInt }.toMap
  }

  /** Objective value Σ Avg_i·s_i — used by tests to compare against brute
    * force enumeration.
    */
  def objective(summaries: Seq[ProviderSummary], alloc: Map[Int, Int]): Double =
    summaries.map(s => s.noisyAvgR * alloc.getOrElse(s.providerId, 0)).sum
}
