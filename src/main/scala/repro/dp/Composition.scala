package repro.dp

/** DP composition accounting (paper Theorems 3.1–3.3 and §6.6).
  *
  * The analyst holds a total budget `(ξ, ψ)`; each query spends `(ε, δ)`.
  * Section 6.6 derives the per-query budget an attacker can afford for
  * `nQueries` queries under three regimes:
  *
  *  - sequential composition: `ε = ξ/n`, `δ = ψ/n`;
  *  - advanced composition [Kairouz et al.]:
  *    `ε = ξ / (2·√(2·n·ln(1/δ)))`, `δ = ψ/n`;
  *  - coalition (parallel composition across colluding analysts, one query
  *    each): `ε = ξ`, `δ = ψ`.
  */
object Composition {

  final case class Budget(eps: Double, delta: Double) {
    require(eps >= 0 && delta >= 0)
    def +(o: Budget): Budget = Budget(eps + o.eps, delta + o.delta)
  }

  /** Sequential composition of `n` mechanisms (Theorem 3.1). */
  def sequential(budgets: Seq[Budget]): Budget =
    budgets.foldLeft(Budget(0, 0))(_ + _)

  /** Parallel composition over disjoint data (Theorem 3.2). */
  def parallel(budgets: Seq[Budget]): Budget =
    Budget(budgets.map(_.eps).max, budgets.map(_.delta).max)

  /** Per-query budget under sequential composition of `n` queries. */
  def sequentialPerQuery(xi: Double, psi: Double, n: Long): Budget =
    Budget(xi / n, psi / n)

  /** Per-query budget under advanced composition (§6.6 formula). */
  def advancedPerQuery(xi: Double, psi: Double, n: Long): Budget = {
    val delta = psi / n
    Budget(xi / (2.0 * math.sqrt(2.0 * n * math.log(1.0 / delta))), delta)
  }

  /** Per-query budget for a coalition of single-query attackers. */
  def coalitionPerQuery(xi: Double, psi: Double): Budget = Budget(xi, psi)
}

/** Running ledger for an analyst's total budget `(ξ, ψ)` (paper §5.4).
  * `tryConsume` refuses queries whose cost would exceed the remainder.
  */
final class BudgetManager(val xi: Double, val psi: Double) {
  private var spentEps = 0.0
  private var spentDelta = 0.0

  def remainingEps: Double   = math.max(0.0, xi - spentEps)
  def remainingDelta: Double = math.max(0.0, psi - spentDelta)

  def tryConsume(eps: Double, delta: Double): Boolean = synchronized {
    val tol = 1e-9 // fp slack so "spend exactly the remainder" succeeds
    if (eps <= remainingEps + tol && delta <= remainingDelta + tol) {
      spentEps += eps; spentDelta += delta; true
    } else false
  }
}
