package repro.federation

import scala.util.Random

import repro.core.{ClusterEval, RangeQuery}
import repro.dp.Laplace
import repro.smc.SecretSharing

/** Protocol-level configuration (paper §5.4 / §6.1 hyperparameters):
  * budget split `ε^O = hp1·ε, ε^S = hp2·ε, ε^E = hp3·ε`, the failure
  * probability δ of the smooth-sensitivity release, and the per-provider
  * approximation threshold `N^min`.
  */
final case class FedConfig(hp1: Double = 0.1, hp2: Double = 0.1, hp3: Double = 0.8,
                           delta: Double = 1e-3, nMin: Int = 8,
                           rFloorFrac: Double = 0.02) {
  require(math.abs(hp1 + hp2 + hp3 - 1.0) < 1e-9, "hp1+hp2+hp3 must be 1")
  require(rFloorFrac >= 0 && rFloorFrac < 1, "rFloorFrac must be in [0,1)")
}

/** Outcome of one online query, with everything the evaluation section
  * reports: the private answer, ground truth, relative error, wall-clock
  * speed-up vs the plain-text scan, cluster-scan accounting, the realized
  * DP noise and the (ε, δ) spent.
  */
final case class RunResult(answer: Double, exact: Double, relativeError: Double,
                           approxMs: Double, exactMs: Double, speedup: Double,
                           scannedClusters: Int, coveringClusters: Int,
                           noise: Double, noiseScale: Double,
                           epsSpent: Double, deltaSpent: Double, usedSmc: Boolean)

/** The end-to-end online protocol (paper Figure 3): aggregator + providers.
  *
  * `run` executes the full query lifecycle — noisy summaries, allocation
  * (Eq 6), per-provider EM sampling + estimation, and the release, either
  * with per-provider Laplace noise (pure-DP path) or with a single noise
  * draw over the SMC-summed estimates (Algorithm 3 lines 7–11).
  */
final class Federation(val providers: Seq[DataProvider], eval: ClusterEval, val cfg: FedConfig) {
  require(providers.nonEmpty)

  /** Plain-text exact answer over the whole federation, timed. */
  def exactWithTime(q: RangeQuery): (Double, Double) = {
    val t0 = System.nanoTime()
    val v = eval.exactTotal(q)
    (v, (System.nanoTime() - t0) / 1e6)
  }

  /** One online query at sampling rate `sr` and total budget `eps`.
    *
    * @param exactBaseline optionally a precomputed `(answer, ms)` so ε
    *                      sweeps over the same query reuse one exact scan.
    */
  def run(q: RangeQuery, sr: Double, eps: Double, useSmc: Boolean, seed: Long,
          exactBaseline: Option[(Double, Double)] = None): RunResult = {
    val rng = new Random(seed)
    val lap = new Laplace(rng)
    val epsO = cfg.hp1 * eps
    val epsS = cfg.hp2 * eps
    val epsE = cfg.hp3 * eps

    val t0 = System.nanoTime()
    // (1–2) summaries, (3) allocation
    val summaries = providers.map(_.summary(q, epsO, lap))
    val alloc = Allocation.allocate(summaries, sr)
    // (4–5) local sampling decisions — metadata only, no scan
    val plans = providers.map(p => p.plan(q, alloc(p.providerId), epsS, rng))
    // one batched evaluation over every provider's sampled clusters: the
    // single-machine analog of the providers scanning in parallel
    val sampled = plans.map(p => p.providerId -> (p.clusterIds: Seq[Int])).toMap
    val qcAll = eval.perCluster(sampled, q)
    // (6) per-provider estimation + smooth sensitivity
    val answers = providers.zip(plans).map { case (p, pl) =>
      val qc = pl.clusterIds.iterator
        .map(c => c -> qcAll.getOrElse((pl.providerId, c), 0.0)).toMap
      p.finish(q, pl, qc, epsE, cfg.delta)
    }

    // (7) release
    val (answer, noise, noiseScale) =
      if (useSmc) {
        val sum = SecretSharing.secureSum(answers.map(_.estimate), rng)
        val maxNum = SecretSharing.secureMax(answers.map(_.sensNumerator), rng)
        val scale = maxNum / epsE
        val n = if (epsE.isPosInfinity) 0.0 else lap.noise(scale)
        (sum + n, n, scale)
      } else {
        val noisy = answers.map { a =>
          if (epsE.isPosInfinity) (a.estimate, 0.0)
          else { val n = lap.noise(a.sensNumerator / epsE); (a.estimate + n, n) }
        }
        val worstScale = answers.map(_.sensNumerator).max / epsE
        (noisy.map(_._1).sum, noisy.map(_._2).sum, worstScale)
      }
    val approxMs = (System.nanoTime() - t0) / 1e6

    val (exact, exactMs) = exactBaseline.getOrElse(exactWithTime(q))
    val relErr = math.abs(answer - exact) / math.max(math.abs(exact), 1e-12)

    RunResult(
      answer = answer, exact = exact, relativeError = relErr,
      approxMs = approxMs, exactMs = exactMs,
      speedup = exactMs / math.max(approxMs, 1e-9),
      scannedClusters = answers.map(_.scannedClusters).sum,
      coveringClusters = answers.map(_.coveringClusters).sum,
      noise = noise, noiseScale = noiseScale,
      // parallel composition across providers, sequential across the three
      // steps (paper §5.4): per query the analyst spends (ε, δ).
      epsSpent = epsO + epsS + epsE, deltaSpent = cfg.delta,
      usedSmc = useSmc)
  }
}
