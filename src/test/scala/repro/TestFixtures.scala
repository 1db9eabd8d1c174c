package repro

import org.apache.spark.sql.DataFrame

import repro.data.Datasets
import repro.federation.{FedConfig, FederationSetup, Setup, Storage}

/** Shared, lazily-built small federations so expensive Spark setup runs once
  * per JVM (tests run in one forked JVM, see build.sbt).
  */
object TestFixtures {
  private def spark = SparkSpec.shared

  val cfg: FedConfig = FedConfig(nMin = 6)

  /** ~20k raw Adult-like rows, 4 providers, cached storage. */
  lazy val adultSmall: FederationSetup =
    Setup.build(spark, Datasets.adultRaw(spark, 20000, seed = 11L),
      Datasets.adultDims.map(_.name), nProviders = 4, clusterFrac = 0.01,
      cfg, Storage.Cached, seed = 42L, skewProviders = true)

  /** Small raw Adult-like frame (not federated) for oracle tests. */
  lazy val adultRawSmall: DataFrame = {
    val df = Datasets.adultRaw(spark, 5000, seed = 19L).cache()
    df.count(); df
  }

  /** Attack dataset fixture. */
  lazy val attackRawSmall: DataFrame = {
    val df = Datasets.attackRaw(spark, 30000, seed = 31L).cache()
    df.count(); df
  }
}
