package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Hansen–Hurwitz estimator properties (Eq 3). Pure math — no Spark. */
class EstimatorSpec extends AnyFunSuite {

  test("empty sample estimates 0") {
    assert(Estimator.hansenHurwitz(Seq.empty) == 0.0)
  }

  test("full sample under uniform probabilities is exact") {
    // p_i = 1/N for all clusters, s = N  =>  E = (1/N) Σ Q_i·N = Σ Q_i
    val qs = Seq(3.0, 7.0, 11.0, 2.0)
    val pairs = qs.map(q => (q, 1.0 / qs.size))
    assert(math.abs(Estimator.hansenHurwitz(pairs) - qs.sum) < 1e-9)
  }

  test("single-cluster sample inflates by 1/p") {
    assert(Estimator.hansenHurwitz(Seq((5.0, 0.25))) == 20.0)
  }

  test("statistically unbiased under pps sampling with replacement") {
    val qs = Vector(10.0, 40.0, 25.0, 5.0, 120.0, 0.0, 66.0, 34.0)
    val total = qs.sum
    val ps = qs.map(q => (q + 1.0) / qs.map(_ + 1.0).sum) // pps-ish, all positive
    val rng = new scala.util.Random(7)
    def draw(): Int = {
      var r = rng.nextDouble(); var i = 0
      while (i < ps.size - 1) { r -= ps(i); if (r <= 0) return i; i += 1 }
      ps.size - 1
    }
    val trials = 4000
    val s = 3
    val mean = (1 to trials).map { _ =>
      Estimator.hansenHurwitz(Seq.fill(s) { val i = draw(); (qs(i), ps(i)) })
    }.sum / trials
    assert(math.abs(mean - total) / total < 0.05, s"mean $mean vs total $total")
  }

  test("estimator variance shrinks with sample size") {
    val qs = Vector(10.0, 40.0, 25.0, 5.0, 120.0, 8.0, 66.0, 34.0)
    val ps = qs.map(q => q / qs.sum)
    val rng = new scala.util.Random(13)
    def draw(): Int = {
      var r = rng.nextDouble(); var i = 0
      while (i < ps.size - 1) { r -= ps(i); if (r <= 0) return i; i += 1 }
      ps.size - 1
    }
    def variance(s: Int): Double = {
      val es = (1 to 2000).map(_ =>
        Estimator.hansenHurwitz(Seq.fill(s) { val i = draw(); (qs(i), ps(i)) }))
      val m = es.sum / es.size
      es.map(e => (e - m) * (e - m)).sum / es.size
    }
    assert(variance(6) < variance(1))
  }

  test("perfect pps probabilities give a zero-variance estimate") {
    // when p_i exactly proportional to Q_i, every term Q_i/p_i = total
    val qs = Vector(10.0, 40.0, 25.0, 5.0)
    val ps = qs.map(_ / qs.sum)
    for (i <- qs.indices)
      assert(math.abs(Estimator.hansenHurwitz(Seq((qs(i), ps(i)))) - qs.sum) < 1e-9)
  }

  test("zero probability is floored, not divided through") {
    val e = Estimator.hansenHurwitz(Seq((1.0, 0.0)))
    assert(!e.isInfinite && e > 0)
  }
}
