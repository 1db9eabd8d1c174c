package repro.baseline

import repro.core.{ClusterEval, RangeQuery}

/** Plain-text (non-private, non-approximate) federated execution — the
  * baseline every speed-up in the paper is measured against: each provider
  * scans its full partition and the results are summed in the clear.
  */
object ExactExecution {

  /** Exact federated answer with wall-clock time in ms. */
  def run(eval: ClusterEval, q: RangeQuery): (Double, Double) = {
    val t0 = System.nanoTime()
    val v = eval.exactTotal(q)
    (v, (System.nanoTime() - t0) / 1e6)
  }

  /** Per-provider exact answers (for tests asserting that local sums equal
    * the federated total).
    */
  def perProvider(eval: ClusterEval, providerIds: Seq[Int], q: RangeQuery): Seq[Double] =
    providerIds.map(eval.exactLocal(_, q))
}
