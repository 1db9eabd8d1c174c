package repro.dp

import scala.util.Random

/** Laplace mechanism (paper Def 3.4): release `f(T) + Lap(GS_f / ε)`.
  *
  * All draws go through an injected [[scala.util.Random]] so tests and
  * benches are reproducible under a fixed seed. `ε = ∞` (used by tests to
  * exercise the noiseless path) yields exactly zero noise.
  */
final class Laplace(rng: Random) {

  /** One sample from Laplace(0, `scale`) by inverse CDF. */
  def noise(scale: Double): Double = {
    if (scale == 0.0 || scale.isInfinity && scale < 0) return 0.0
    // u uniform in (-1/2, 1/2); Lap sample = -b * sgn(u) * ln(1 - 2|u|)
    var u = rng.nextDouble() - 0.5
    while (u == -0.5) u = rng.nextDouble() - 0.5
    -scale * math.signum(u) * math.log1p(-2.0 * math.abs(u))
  }

  /** `value + Lap(sensitivity / eps)` — ε-DP for a query of the given
    * global (or smooth-upper-bounded) sensitivity.
    */
  def perturb(value: Double, sensitivity: Double, eps: Double): Double =
    if (eps.isPosInfinity) value
    else value + noise(sensitivity / eps)
}
