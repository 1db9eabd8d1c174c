package repro.dp

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

/** Smooth sensitivity of the estimator term (Theorems 5.3/5.4, Eq 10,
  * Appendix B): scenario dominance, the k bound, and scaling behaviour.
  */
class SmoothSensitivitySpec extends AnyFunSuite {

  test("beta formula (Eq 10)") {
    val b = SmoothSensitivity.beta(0.8, 1e-3)
    assert(math.abs(b - 0.8 / (2 * math.log(2000.0))) < 1e-12)
  }

  test("delta outside (0,1) is rejected") {
    intercept[IllegalArgumentException](SmoothSensitivity.beta(1.0, 0.0))
    intercept[IllegalArgumentException](SmoothSensitivity.beta(1.0, 1.0))
  }

  test("kMax bounds the argmax of e^{-beta k}·k (Appendix B.3)") {
    for (eps <- Seq(0.1, 0.5, 0.8, 1.0, 2.0); delta <- Seq(1e-3, 1e-6)) {
      val b = SmoothSensitivity.beta(eps, delta)
      val kMax = SmoothSensitivity.kMax(b)
      def term(k: Int) = math.exp(-b * k) * k
      val within = (0 to kMax).map(term).max
      val beyond = (kMax + 1 to kMax * 10).map(term).max
      assert(within >= beyond, s"eps=$eps delta=$delta: max must be reached by k=$kMax")
    }
  }

  test("smooth equals brute-force max over a long horizon") {
    val rng = new Random(1)
    for (_ <- 1 to 50) {
      val slope = rng.nextDouble() * 100
      val eps = 0.1 + rng.nextDouble()
      val delta = 1e-4
      val b = SmoothSensitivity.beta(eps, delta)
      val brute = (0 to 10 * SmoothSensitivity.kMax(b)).map(k => math.exp(-b * k) * k * slope).max
      assert(math.abs(SmoothSensitivity.smooth(slope, eps, delta) - brute) < 1e-9)
    }
  }

  test("smooth sensitivity is proportional to the slope") {
    val a = SmoothSensitivity.smooth(1.0, 0.8, 1e-3)
    val b = SmoothSensitivity.smooth(7.0, 0.8, 1e-3)
    assert(math.abs(b - 7 * a) < 1e-9)
  }

  test("zero slope yields zero sensitivity") {
    assert(SmoothSensitivity.smooth(0.0, 0.8, 1e-3) == 0.0)
  }

  test("smooth is at least the k=1 local sensitivity discounted once") {
    val slope = 5.0
    val eps = 0.8; val delta = 1e-3
    val b = SmoothSensitivity.beta(eps, delta)
    assert(SmoothSensitivity.smooth(slope, eps, delta) >= math.exp(-b) * slope - 1e-12)
  }

  test("dominance condition picks the true max of scenarios 1 and 4 (Theorem 5.4)") {
    val rng = new Random(2)
    for (_ <- 1 to 500) {
      val sumR = 0.5 + rng.nextDouble() * 50
      val r = math.min(sumR, 0.01 + rng.nextDouble())
      val p = r / sumR
      val dR = 0.001 + rng.nextDouble() * 0.2
      val qC = rng.nextDouble() * 2000
      val s1 = qC * dR / r // scenario-1 slope
      val s4 = 1.0 / p     // scenario-4 slope
      val got = SmoothSensitivity.dominantSlope(qC, r, p, sumR, dR)
      // Theorem 5.4: scenario 1 dominates iff Q(C) > ΣR/Δ_R. At the
      // boundary both slopes coincide (Q(C)·Δ_R/R = ΣR·Δ_R/R·... ), so
      // comparing against the true max is the stronger check:
      assert(math.abs(got - math.max(s1, s4)) < 1e-9 ||
        (qC <= sumR / dR && got == s4) || (qC > sumR / dR && got == s1),
        s"qC=$qC r=$r p=$p sumR=$sumR dR=$dR: got $got, s1=$s1, s4=$s4")
    }
  }

  test("dominance threshold is exact: slopes cross at Q(C) = ΣR/Δ_R") {
    val sumR = 10.0; val r = 0.5; val p = r / sumR; val dR = 0.05
    val qStar = sumR / dR
    val s1 = qStar * dR / r
    val s4 = 1.0 / p
    assert(math.abs(s1 - s4) < 1e-9)
  }

  test("forCluster is monotone in Q(C) once scenario 1 dominates") {
    val sumR = 5.0; val r = 0.2; val p = r / sumR; val dR = 0.1
    val big = sumR / dR * 2
    val a = SmoothSensitivity.forCluster(big, r, p, sumR, dR, 0.8, 1e-3)
    val b = SmoothSensitivity.forCluster(big * 3, r, p, sumR, dR, 0.8, 1e-3)
    assert(b > a)
  }

  test("forEstimator averages per-cluster bounds (Eq 9)") {
    assert(SmoothSensitivity.forEstimator(Seq(2.0, 4.0, 6.0)) == 4.0)
    assert(SmoothSensitivity.forEstimator(Seq.empty) == 0.0)
  }

  test("degenerate zero probability stays finite via the floor") {
    val v = SmoothSensitivity.forCluster(0.0, 0.0, 0.0, 0.0, 0.1, 0.8, 1e-3)
    assert(!v.isInfinite && !v.isNaN)
  }

  test("smaller delta means a smaller beta and a larger smooth bound") {
    val tight = SmoothSensitivity.smooth(3.0, 0.8, 1e-2)
    val loose = SmoothSensitivity.smooth(3.0, 0.8, 1e-8)
    assert(loose > tight)
  }
}
