package repro.dp

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

/** Laplace mechanism: distributional shape, determinism, noiseless limit. */
class LaplaceSpec extends AnyFunSuite {

  private def samples(scale: Double, n: Int, seed: Long): Seq[Double] = {
    val lap = new Laplace(new Random(seed))
    Seq.fill(n)(lap.noise(scale))
  }

  test("noise is centered at zero") {
    val xs = samples(2.0, 50000, 1)
    assert(math.abs(xs.sum / xs.size) < 0.05)
  }

  test("mean absolute deviation matches the scale (E|X| = b)") {
    val b = 3.0
    val xs = samples(b, 50000, 2)
    val mad = xs.map(math.abs).sum / xs.size
    assert(math.abs(mad - b) / b < 0.05, s"MAD $mad vs scale $b")
  }

  test("variance matches 2b^2") {
    val b = 1.5
    val xs = samples(b, 80000, 3)
    val v = xs.map(x => x * x).sum / xs.size
    assert(math.abs(v - 2 * b * b) / (2 * b * b) < 0.1, s"var $v vs ${2 * b * b}")
  }

  test("roughly symmetric sign split") {
    val xs = samples(1.0, 50000, 4)
    val pos = xs.count(_ > 0).toDouble / xs.size
    assert(math.abs(pos - 0.5) < 0.02)
  }

  test("deterministic under a fixed seed") {
    assert(samples(1.0, 100, 42) == samples(1.0, 100, 42))
  }

  test("different seeds give different draws") {
    assert(samples(1.0, 100, 42) != samples(1.0, 100, 43))
  }

  test("zero scale is exactly zero noise") {
    assert(samples(0.0, 10, 5).forall(_ == 0.0))
  }

  test("perturb adds Lap(sensitivity/eps)") {
    // with eps huge the perturbation is negligible relative to the value
    val lap = new Laplace(new Random(6))
    val v = lap.perturb(1000.0, 1.0, 1e9)
    assert(math.abs(v - 1000.0) < 1e-3)
  }

  test("perturb with infinite epsilon is the identity") {
    val lap = new Laplace(new Random(7))
    assert(lap.perturb(123.45, 5.0, Double.PositiveInfinity) == 123.45)
  }

  test("larger epsilon concentrates the noise") {
    def spread(eps: Double): Double = {
      val lap = new Laplace(new Random(8))
      val xs = Seq.fill(20000)(lap.perturb(0.0, 1.0, eps))
      xs.map(math.abs).sum / xs.size
    }
    assert(spread(10.0) < spread(0.1))
  }
}
