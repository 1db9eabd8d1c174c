package repro.bench

import repro.SparkSpec
import repro.federation.{FederationSetup, Storage}
import repro.harness.Tables

/** Shared bench-scale federations, built once per bench JVM.
  *
  * Scale (DESIGN.md §4/§5): the paper ran 4M-row Adult and 924M-row Amazon
  * Review on a 5-server Grid5000 cluster; these benches run SF-scaled
  * versions (~150k / ~600k raw rows) on one box with parquet-backed
  * clusters, preserving Amazon ≫ Adult. Override with REPRO_BENCH_ADULT /
  * REPRO_BENCH_AMAZON / REPRO_BENCH_M.
  */
object BenchFixtures {
  private def env(name: String, default: Long): Long =
    sys.env.get(name).map(_.toLong).getOrElse(default)

  val adultRows: Long  = env("REPRO_BENCH_ADULT", 1600000L)
  val amazonRows: Long = env("REPRO_BENCH_AMAZON", 24000000L)
  val attackRows: Long = env("REPRO_BENCH_ATTACK", 40000L)
  val m: Int           = env("REPRO_BENCH_M", 8L).toInt

  lazy val adult: FederationSetup =
    Tables.setupAdult(SparkSpec.shared, adultRows, Storage.Parquet())

  lazy val amazon: FederationSetup =
    Tables.setupAmazon(SparkSpec.shared, amazonRows, Storage.Parquet())

  /** Warm the JVM/Spark paths once so the first measured query is not a
    * cold-start outlier.
    */
  lazy val warmed: Unit = {
    import repro.core.{Agg, DimRange, RangeQuery}
    val q = RangeQuery(Agg.Count, Seq(DimRange("age", 20, 60)))
    adult.federation.run(q, 0.2, 1.0, useSmc = false, seed = 0)
    ()
  }
}
