package repro.federation

import java.nio.file.Files

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

import repro.core._

/** How the clustered federated tensor is materialized.
  *
  *  - [[Storage.Parquet]]: written partitioned by `(provider_id,
  *    cluster_id)` and read back, so sampled-cluster scans touch only the
  *    sampled files (real I/O saving — used by timing benches);
  *  - [[Storage.Cached]]: kept as a cached DataFrame (fast to set up — used
  *    by unit tests).
  */
sealed trait Storage
object Storage {
  final case class Parquet(dir: Option[String] = None) extends Storage
  case object Cached                                    extends Storage
}

/** Everything `Setup.build` produces: the live protocol objects plus the
  * physical artifacts tests and benches need to poke at.
  */
final case class FederationSetup(federation: Federation, eval: ClusterEval,
                                 clustered: DataFrame, dims: Seq[String], S: Int,
                                 metas: Seq[ProviderMetadata]) {
  /** Build an in-memory evaluator over the same clustered tensor, for
    * harnesses that replay many protocol runs without Spark jobs.
    */
  def inMemory(cfg: FedConfig): Federation = {
    val mem = InMemoryClusterEval.fromDataFrame(clustered, dims)
    new Federation(metas.map(new DataProvider(_, mem, cfg.nMin, cfg.rFloorFrac)), mem, cfg)
  }
}

/** Offline phase of the paper (§5.2) as one Spark dataflow: horizontal
  * partitioning across providers, per-provider count-tensor construction,
  * cluster (page) assignment, materialization, and Algorithm 1 metadata.
  */
object Setup {

  /** @param raw          raw rows with integer dimension columns
    * @param dims         tensor dimensions `D^a`
    * @param nProviders   number of data providers (paper uses 4)
    * @param clusterFrac  S as a fraction of the average provider-local
    *                     tensor size (paper: 1% Adult, 0.5% Amazon)
    * @param skewProviders when true, rows with high first-dimension values
    *                     concentrate on low provider ids, so the global
    *                     (distribution-aware) allocation visibly matters
    * @param seed         drives the provider split only; everything else is
    *                     deterministic given the data
    */
  def build(spark: SparkSession, raw: DataFrame, dims: Seq[String], nProviders: Int,
            clusterFrac: Double, cfg: FedConfig, storage: Storage,
            seed: Long = 42L, skewProviders: Boolean = false): FederationSetup = {
    require(nProviders >= 1)
    require(clusterFrac > 0 && clusterFrac <= 1)

    // 1. horizontal partitioning: provider_id per raw row
    val withProvider =
      if (!skewProviders) {
        raw.withColumn(Clustering.ProviderCol,
          least(lit(nProviders - 1), floor(rand(seed) * nProviders)).cast("int"))
      } else {
        val d0 = dims.head
        val stats = raw.agg(min(col(d0)).cast("double"), max(col(d0)).cast("double")).head
        val (lo, hi) = (stats.getDouble(0), stats.getDouble(1))
        val span = math.max(hi - lo, 1.0)
        // shape exponent grows with d0, biasing high-d0 rows to provider 0
        val shaped = pow(rand(seed), lit(1.0) + (col(d0).cast("double") - lo) / span * lit(3.0))
        raw.withColumn(Clustering.ProviderCol,
          least(lit(nProviders - 1), floor(shaped * nProviders)).cast("int"))
      }

    // 2. per-provider count tensor, built in one pass
    val tensor = withProvider
      .groupBy((col(Clustering.ProviderCol) +: dims.map(col)): _*)
      .agg(count(lit(1)).cast("long").as(Tensor.MeasureCol))

    // 3. common cluster size S from the average provider tensor size
    val counts = tensor.groupBy(col(Clustering.ProviderCol)).agg(count(lit(1)).as("n"))
      .collect().map(_.getLong(1))
    val avgRows = counts.sum.toDouble / math.max(1, counts.length)
    val S = math.max(1, math.round(clusterFrac * avgRows).toInt)

    val assigned = Clustering.assignPerProvider(tensor, dims, S)

    // 4. materialize
    val clustered = storage match {
      case Storage.Cached =>
        val df = assigned.cache(); df.count(); df
      case Storage.Parquet(dirOpt) =>
        val dir = dirOpt.getOrElse(
          Files.createTempDirectory("repro-fed-").toAbsolutePath.toString)
        assigned.write
          .mode("overwrite")
          .partitionBy(Clustering.ProviderCol, Clustering.ClusterCol)
          .parquet(dir)
        spark.read.parquet(dir)
    }

    // 5. Algorithm 1 metadata, per provider
    val providerIds = clustered.select(col(Clustering.ProviderCol)).distinct()
      .collect().map(_.getInt(0)).sorted.toSeq
    val metas = providerIds.map { pid =>
      Metadata.build(
        clustered.filter(col(Clustering.ProviderCol) === pid), dims, S, pid)
    }

    val eval = new SparkClusterEval(clustered)
    val providers = metas.map(new DataProvider(_, eval, cfg.nMin, cfg.rFloorFrac))
    FederationSetup(new Federation(providers, eval, cfg), eval, clustered, dims, S, metas)
  }
}
