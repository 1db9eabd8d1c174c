package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.harness.Tables

/** Figure 4 (+ Figure 7 dimension axis): relative error and speed-up vs the
  * number of query dimensions. Paper: sr = 20% Adult / 5% Amazon, ε = 1;
  * error < 11% (Adult COUNT) / 17% (Adult SUM) / 2.5% (Amazon COUNT) /
  * 5% (Amazon SUM); error → ~0 at n = 2; speed-up falls as n grows.
  */
class F4DimensionBench extends SparkSpec {

  private lazy val rows = {
    BenchFixtures.warmed
    Tables.dimensionAnalysis(BenchFixtures.adult, "Adult", Datasets.adultDims,
      2 to 6, BenchFixtures.m, sr = 0.20) ++
      Tables.dimensionAnalysis(BenchFixtures.amazon, "Amazon", Datasets.amazonDims,
        2 to 5, BenchFixtures.m, sr = 0.05)
  }

  test("print Figure 4/7 table") {
    println("== Figure 4/7: dimension-based analysis (paper: err<=17% Adult, <=5% Amazon; speedup 6-8x Amazon, falling with n) ==")
    println(Tables.fmt(rows, Seq("dataset", "n", "agg", "avgRelErr", "avgSpeedup")))
  }

  test("shape: low-dimensional queries are near-exact") {
    val lowDim = rows.filter(_.n == 2)
    assert(lowDim.forall(_.avgRelErr < 0.10),
      s"n=2 errors should be close to 0: ${lowDim.map(r => (r.dataset, r.agg, r.avgRelErr))}")
  }

  test("shape: errors stay moderate at every dimensionality") {
    // the paper reports <=17% on datasets 5-150x larger; relative DP error
    // scales inversely with answer size, so the bound here is looser
    assert(rows.forall(_.avgRelErr < 0.8),
      s"outliers: ${rows.filter(_.avgRelErr >= 0.8)}")
  }

  test("shape: error grows with the number of dimensions on average") {
    def meanErr(f: Tables.DimRow => Boolean) = {
      val sel = rows.filter(f); sel.map(_.avgRelErr).sum / sel.size
    }
    val lo = meanErr(r => r.n <= 3)
    val hi = meanErr(r => r.n >= 4)
    assert(hi > lo, s"mean err n<=3: $lo vs n>=4: $hi")
  }

  test("shape: the approximation is faster than the plain-text scan") {
    val mean = rows.map(_.avgSpeedup).sum / rows.size
    assert(mean > 1.0, s"mean speed-up $mean")
  }
}
