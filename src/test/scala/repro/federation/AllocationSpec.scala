package repro.federation

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

/** Allocation LP (Eq 6): greedy solver optimality (vs brute force),
  * constraint satisfaction, and robustness to noisy inputs.
  */
class AllocationSpec extends AnyFunSuite {

  private def total(summaries: Seq[ProviderSummary], sr: Double): Long = {
    val caps = summaries.map(s => math.max(1L, math.round(s.noisyN)))
    math.min(caps.sum, math.max(summaries.size.toLong, math.round(sr * caps.sum.toDouble)))
  }

  /** Brute-force the best integer allocation by enumeration. */
  private def brute(summaries: Seq[ProviderSummary], sr: Double): Double = {
    val caps = summaries.map(s => math.max(1L, math.round(s.noisyN)).toInt)
    val t = total(summaries, sr).toInt
    def rec(i: Int, left: Int): Double =
      if (i == summaries.size) { if (left == 0) 0.0 else Double.NegativeInfinity }
      else (1 to math.min(caps(i), left)).map(si =>
        summaries(i).noisyAvgR * si + rec(i + 1, left - si)).foldLeft(Double.NegativeInfinity)(math.max)
    rec(0, t)
  }

  test("allocation sums to sr × total covering clusters") {
    val s = Seq(ProviderSummary(0, 100, 0.5), ProviderSummary(1, 200, 0.2),
      ProviderSummary(2, 50, 0.9), ProviderSummary(3, 150, 0.1))
    val a = Allocation.allocate(s, 0.2)
    assert(a.values.sum == total(s, 0.2))
  }

  test("every provider receives at least 1 and at most its cap") {
    val s = Seq(ProviderSummary(0, 10, 0.9), ProviderSummary(1, 1000, 0.1))
    val a = Allocation.allocate(s, 0.5)
    assert(a.values.forall(_ >= 1))
    assert(a(0) <= 10 && a(1) <= 1000)
  }

  test("providers with higher Avg(R) receive more") {
    val s = Seq(ProviderSummary(0, 100, 0.9), ProviderSummary(1, 100, 0.1))
    val a = Allocation.allocate(s, 0.3)
    assert(a(0) > a(1))
  }

  test("greedy matches brute force on random small instances") {
    val rng = new Random(1)
    for (_ <- 1 to 200) {
      val k = 2 + rng.nextInt(3)
      val s = (0 until k).map(i =>
        ProviderSummary(i, 2 + rng.nextInt(12), rng.nextDouble()))
      val sr = 0.1 + rng.nextDouble() * 0.8
      val got = Allocation.objective(s, Allocation.allocate(s, sr))
      val best = brute(s, sr)
      assert(math.abs(got - best) < 1e-9, s"summaries=$s sr=$sr: got $got, best $best")
    }
  }

  test("negative noisy N is clamped to a cap of 1") {
    val s = Seq(ProviderSummary(0, -5.2, 0.4), ProviderSummary(1, 100, 0.6))
    val a = Allocation.allocate(s, 0.2)
    assert(a(0) == 1)
    assert(a.values.sum == total(s, 0.2))
  }

  test("allocation never exceeds the sum of caps even for large sr") {
    val s = Seq(ProviderSummary(0, 3, 0.5), ProviderSummary(1, 4, 0.5))
    val a = Allocation.allocate(s, 0.99)
    assert(a.values.sum <= 7)
  }

  test("equal Avg(R) still yields a feasible exact-total allocation") {
    val s = (0 until 4).map(i => ProviderSummary(i, 100, 0.5))
    val a = Allocation.allocate(s, 0.25)
    assert(a.values.sum == total(s, 0.25))
    assert(a.values.forall(v => v >= 1 && v <= 100))
  }

  test("tiny sr still gives every provider its floor of 1") {
    val s = (0 until 4).map(i => ProviderSummary(i, 1000, 0.1 * (i + 1)))
    val a = Allocation.allocate(s, 0.0001)
    assert(a.values.forall(_ == 1))
  }

  test("sampling rate outside (0,1) is rejected") {
    val s = Seq(ProviderSummary(0, 10, 0.5), ProviderSummary(1, 10, 0.5))
    intercept[IllegalArgumentException](Allocation.allocate(s, 0.0))
    intercept[IllegalArgumentException](Allocation.allocate(s, 1.0))
  }

  test("empty provider list is rejected") {
    intercept[IllegalArgumentException](Allocation.allocate(Seq.empty, 0.5))
  }
}
