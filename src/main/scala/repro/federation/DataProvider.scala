package repro.federation

import scala.util.Random

import repro.core._
import repro.dp.{Exponential, Laplace, Sensitivity, SmoothSensitivity}

/** One provider's un-released local answer for a query.
  *
  * `sensNumerator` is the numerator of the Laplace scale used at release:
  * `2·Δ_E` (smooth sensitivity, Algorithm 3 line 10) on the approximation
  * path, or the plain global sensitivity 1 on the exact (`N^Q < N^min`)
  * path. Release noise is `Lap(sensNumerator / ε^E)`.
  */
final case class LocalAnswer(providerId: Int, estimate: Double, sensNumerator: Double,
                             scannedClusters: Int, coveringClusters: Int, exactPath: Boolean)

/** A data provider in the federation (paper §5.3).
  *
  * Holds its offline metadata ([[repro.core.ProviderMetadata]], Algorithm 1)
  * and a handle to the physical evaluation of its clusters. All privacy
  * decisions — what leaves this object — go through DP mechanisms:
  * Laplace-perturbed summaries (Eq 5), EM cluster sampling (Algorithm 2),
  * and smooth-sensitivity-calibrated release (Algorithm 3).
  */
final class DataProvider(val meta: ProviderMetadata, eval: ClusterEval, val nMin: Int,
                         val rFloorFrac: Double = 0.02) {
  require(nMin >= 1, "N^min must be at least 1")
  require(rFloorFrac >= 0 && rFloorFrac < 1)

  def providerId: Int = meta.providerId

  /** `C^Q` and the approximated proportions `R̂` (Eq 1/2), from metadata
    * only — no data scan.
    *
    * Two refinements over the raw Eq 2 box test (DESIGN.md §4):
    *  - clusters with `R = 0` are dropped: a zero per-dimension marginal
    *    proves the cluster holds no matching row, so it cannot contribute;
    *  - clusters with `R` below `rFloorFrac ×` the mean positive proportion
    *    are dropped — a safety net against the paper's scenario-4 local
    *    sensitivity `1/p`, which explodes when a near-empty boundary cluster
    *    is EM-sampled (a regime the paper's page-clustered data never
    *    enters). The bias is at most `rFloorFrac` of the per-cluster average
    *    mass per dropped cluster, and `1/p ≤ N^Q/rFloorFrac` afterwards.
    */
  def covering(q: RangeQuery): (Vector[ClusterMeta], Vector[Double]) = {
    val cq = meta.coveringClusters(q)
    val rs = meta.proportions(cq, q)
    val pos = cq.zip(rs).filter(_._2 > 0.0)
    if (pos.isEmpty) return (Vector.empty, Vector.empty)
    val theta = rFloorFrac * (pos.map(_._2).sum / pos.size)
    val kept = pos.filter(_._2 >= theta)
    (kept.map(_._1), kept.map(_._2))
  }

  /** Allocation-phase summary (Eq 5): `Ñ^Q` and `Ãvg(R̂)`, each perturbed
    * with half of the ε^O budget.
    */
  def summary(q: RangeQuery, epsO: Double, lap: Laplace): ProviderSummary = {
    val (cq, rs) = covering(q)
    val avg = if (cq.isEmpty) 0.0 else rs.sum / cq.size
    val dAvg = Sensitivity.deltaAvgR(meta.S, q.nDims, nMin)
    ProviderSummary(
      providerId,
      lap.perturb(cq.size.toDouble, Sensitivity.deltaNQ, epsO / 2.0),
      lap.perturb(avg, dAvg, epsO / 2.0))
  }

  /** Phase 1 of the online answer (steps 4–5): decide which clusters to
    * scan. Returns an exact-path plan when `N^Q < N^min`, otherwise the
    * EM-sampled cluster ids together with the probabilities/proportions the
    * estimation phase needs. No data is scanned here.
    */
  def plan(q: RangeQuery, s: Int, epsS: Double, rng: Random): SamplingPlan = {
    val (cq, rs) = covering(q)
    val nQ = cq.size

    if (nQ < nMin) {
      // §5.3.1: the approximation gate — compute Q "regularly" over the
      // covering clusters; release sensitivity is the plain GS of 1.
      SamplingPlan(providerId, exactPath = true, cq.map(_.clusterId),
        ps = Vector.empty, rs = Vector.empty, sumR = rs.sum, nQ = nQ)
    } else {
      val ps = meta.samplingProbabilities(rs)
      val take = math.min(math.max(s, 1), nQ)
      val picked = Exponential.sampleWithoutReplacement(
        ps, take, epsS, Sensitivity.deltaP(nMin), rng)
      SamplingPlan(providerId, exactPath = false, picked.map(cq(_).clusterId),
        ps = picked.map(ps), rs = picked.map(rs), sumR = rs.sum, nQ = nQ)
    }
  }

  /** Phase 2 (step 6): turn the per-cluster results `Q(C)` of the planned
    * scan into the Hansen–Hurwitz estimate and its smooth sensitivity.
    * `qc` maps the plan's cluster ids to their query results.
    */
  def finish(q: RangeQuery, p: SamplingPlan, qc: Map[Int, Double],
             epsE: Double, delta: Double): LocalAnswer = {
    if (p.exactPath) {
      val exact = p.clusterIds.iterator.map(qc.getOrElse(_, 0.0)).sum
      return LocalAnswer(providerId, exact, sensNumerator = 1.0,
        scannedClusters = p.clusterIds.size, coveringClusters = p.nQ, exactPath = true)
    }
    val pairs = p.clusterIds.zipWithIndex.map { case (cid, i) => (qc(cid), p.ps(i)) }
    val estimate = Estimator.hansenHurwitz(pairs)

    val dR = Sensitivity.deltaR(meta.S, q.nDims)
    val perClusterSls = p.clusterIds.zipWithIndex.map { case (cid, i) =>
      SmoothSensitivity.forCluster(qC = qc(cid), r = p.rs(i), p = p.ps(i),
        sumR = p.sumR, dR = dR, eps = epsE, delta = delta)
    }
    val deltaE = SmoothSensitivity.forEstimator(perClusterSls)

    LocalAnswer(providerId, estimate, sensNumerator = 2.0 * deltaE,
      scannedClusters = p.clusterIds.size, coveringClusters = p.nQ, exactPath = false)
  }

  /** Convenience single-provider answer (plan → scan → finish) used by unit
    * tests; [[Federation.run]] instead batches every provider's scan into
    * one evaluation call, the single-machine analog of providers scanning
    * in parallel.
    */
  def answer(q: RangeQuery, s: Int, epsS: Double, epsE: Double, delta: Double,
             rng: Random): LocalAnswer = {
    val p = plan(q, s, epsS, rng)
    val qc =
      if (p.clusterIds.isEmpty) Map.empty[Int, Double]
      else eval.perCluster(Map(providerId -> p.clusterIds), q)
        .map { case ((_, c), v) => c -> v }
    finish(q, p, qc, epsE, delta)
  }
}

/** Output of [[DataProvider.plan]]: which clusters to scan and the sampling
  * state needed to finish the estimate.
  */
final case class SamplingPlan(providerId: Int, exactPath: Boolean,
                              clusterIds: Vector[Int], ps: Vector[Double],
                              rs: Vector[Double], sumR: Double, nQ: Int)
