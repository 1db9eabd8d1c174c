package repro.dp

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

/** Closed-form sensitivities: Theorems 5.1, 5.2 and Eq 12, with seeded
  * property sweeps over the parameter space.
  */
class SensitivitySpec extends AnyFunSuite {

  private def sweep(n: Int, seed: Long)(body: (Int, Int, Int) => Unit): Unit = {
    val rng = new Random(seed)
    for (_ <- 1 to n)
      body(2 + rng.nextInt(100000), 1 + rng.nextInt(10), 1 + rng.nextInt(1000))
  }

  test("deltaR closed form: 1 - (1 - 1/S)^|D|") {
    assert(math.abs(Sensitivity.deltaR(100, 1) - 0.01) < 1e-12)
    assert(math.abs(Sensitivity.deltaR(100, 2) - (1 - 0.99 * 0.99)) < 1e-12)
    assert(math.abs(Sensitivity.deltaR(2, 1) - 0.5) < 1e-12)
  }

  test("deltaR lies in (0, 1] and grows with the number of dimensions") {
    sweep(200, 1) { (s, d, _) =>
      val v = Sensitivity.deltaR(s, d)
      assert(v > 0 && v <= 1)
      assert(Sensitivity.deltaR(s, d + 1) >= v)
    }
  }

  test("deltaR shrinks with larger clusters") {
    sweep(200, 2) { (s, d, _) =>
      assert(Sensitivity.deltaR(s + 1, d) <= Sensitivity.deltaR(s, d))
    }
  }

  test("deltaR dominates 1/S^|D| (Appendix A.1, Eq 14)") {
    sweep(200, 3) { (s, d, _) =>
      assert(Sensitivity.deltaR(s, d) >= math.pow(s.toDouble, -d) - 1e-15)
    }
  }

  test("deltaAvgR is the max of its two scenario bounds (Theorem 5.1)") {
    sweep(200, 4) { (s, d, nMin) =>
      val got = Sensitivity.deltaAvgR(s, d, nMin)
      val s1 = Sensitivity.deltaR(s, d) / nMin
      val s2 = 1.0 / (nMin + 1)
      assert(got == math.max(s1, s2))
    }
  }

  test("deltaAvgR decreases in N^min") {
    sweep(200, 5) { (s, d, nMin) =>
      assert(Sensitivity.deltaAvgR(s, d, nMin + 1) <= Sensitivity.deltaAvgR(s, d, nMin))
    }
  }

  test("deltaP closed form: 1/(N^min (N^min+1)) (Theorem 5.2)") {
    assert(Sensitivity.deltaP(1) == 0.5)
    assert(math.abs(Sensitivity.deltaP(10) - 1.0 / 110) < 1e-15)
  }

  test("deltaP matches the worst-case probability gap it bounds (Eq 7)") {
    sweep(200, 6) { (_, _, n) =>
      val gap = math.abs(1.0 / n - 1.0 / (n + 1))
      assert(math.abs(Sensitivity.deltaP(n) - gap) < 1e-15)
    }
  }

  test("deltaP decreases in N^min") {
    sweep(200, 7) { (_, _, n) =>
      assert(Sensitivity.deltaP(n + 1) < Sensitivity.deltaP(n))
    }
  }

  test("N^Q sensitivity is 1") {
    assert(Sensitivity.deltaNQ == 1.0)
  }

  test("invalid parameters are rejected") {
    intercept[IllegalArgumentException](Sensitivity.deltaR(0, 1))
    intercept[IllegalArgumentException](Sensitivity.deltaR(10, 0))
    intercept[IllegalArgumentException](Sensitivity.deltaAvgR(10, 1, 0))
    intercept[IllegalArgumentException](Sensitivity.deltaP(0))
  }
}
