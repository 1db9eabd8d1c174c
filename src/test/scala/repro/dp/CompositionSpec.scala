package repro.dp

import org.scalatest.funsuite.AnyFunSuite

import Composition.Budget

/** Composition theorems and the analyst budget ledger (§5.4, §6.6). */
class CompositionSpec extends AnyFunSuite {

  test("sequential composition sums budgets (Theorem 3.1)") {
    val got = Composition.sequential(Seq(Budget(0.1, 1e-4), Budget(0.2, 2e-4), Budget(0.3, 0)))
    assert(math.abs(got.eps - 0.6) < 1e-12 && math.abs(got.delta - 3e-4) < 1e-12)
  }

  test("parallel composition takes the max (Theorem 3.2)") {
    val got = Composition.parallel(Seq(Budget(0.1, 1e-4), Budget(0.5, 1e-6), Budget(0.3, 2e-4)))
    assert(got == Budget(0.5, 2e-4))
  }

  test("sequential per-query budget splits evenly") {
    val b = Composition.sequentialPerQuery(10.0, 1e-3, 100)
    assert(math.abs(b.eps - 0.1) < 1e-12 && math.abs(b.delta - 1e-5) < 1e-15)
  }

  test("advanced composition formula matches §6.6") {
    val xi = 10.0; val psi = 1e-6; val n = 3901L
    val b = Composition.advancedPerQuery(xi, psi, n)
    val delta = psi / n
    val expected = xi / (2.0 * math.sqrt(2.0 * n * math.log(1.0 / delta)))
    assert(math.abs(b.eps - expected) < 1e-12 && b.delta == delta)
  }

  test("advanced composition allows a larger per-query epsilon than sequential for large n") {
    for (n <- Seq(1000L, 3901L, 100000L)) {
      val seq = Composition.sequentialPerQuery(1.0, 1e-6, n)
      val adv = Composition.advancedPerQuery(1.0, 1e-6, n)
      assert(adv.eps > seq.eps, s"n=$n: ${adv.eps} <= ${seq.eps}")
    }
  }

  test("advanced composition is not worthwhile for small query counts") {
    // the √(n·ln(1/δ)) constant dominates below a crossover point
    val seq = Composition.sequentialPerQuery(1.0, 1e-6, 100)
    val adv = Composition.advancedPerQuery(1.0, 1e-6, 100)
    assert(adv.eps < seq.eps)
  }

  test("coalition per-query budget is the full budget") {
    assert(Composition.coalitionPerQuery(50.0, 1e-6) == Budget(50.0, 1e-6))
  }

  test("n sequential queries at the per-query budget exactly exhaust the total") {
    val n = 37
    val per = Composition.sequentialPerQuery(2.0, 1e-3, n)
    val total = Composition.sequential(Seq.fill(n)(per))
    assert(math.abs(total.eps - 2.0) < 1e-9 && math.abs(total.delta - 1e-3) < 1e-12)
  }

  test("budget manager admits queries until the budget runs out") {
    val bm = new BudgetManager(1.0, 1e-3)
    assert(bm.tryConsume(0.4, 1e-4))
    assert(bm.tryConsume(0.4, 1e-4))
    assert(!bm.tryConsume(0.4, 1e-4)) // 1.2 > 1.0
    assert(bm.tryConsume(0.2, 1e-4))  // exactly exhausts eps
    assert(!bm.tryConsume(0.01, 0))
  }

  test("budget manager enforces delta independently") {
    val bm = new BudgetManager(10.0, 1e-4)
    assert(bm.tryConsume(0.1, 1e-4))
    assert(!bm.tryConsume(0.1, 1e-5)) // delta exhausted even though eps remains
    assert(bm.tryConsume(0.1, 0.0))   // zero-delta query still fine
  }

  test("budget manager tracks remaining budget") {
    val bm = new BudgetManager(1.0, 1e-3)
    bm.tryConsume(0.25, 2e-4)
    assert(math.abs(bm.remainingEps - 0.75) < 1e-12)
    assert(math.abs(bm.remainingDelta - 8e-4) < 1e-12)
  }

  test("negative budgets are rejected") {
    intercept[IllegalArgumentException](Budget(-0.1, 0))
    intercept[IllegalArgumentException](Budget(0.1, -1e-6))
  }
}
