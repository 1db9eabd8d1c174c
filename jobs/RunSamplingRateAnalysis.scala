package repro.jobs

import repro.data.Datasets
import repro.federation.Storage
import repro.harness.Tables

/** Figure 5: relative error and speed-up vs sampling rate.
  * Args: [adultRows] [amazonRows] [m].
  */
object RunSamplingRateAnalysis {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("repro-sampling-rate-analysis")
    val adultRows  = JobSession.arg(args, 0, 1600000L)
    val amazonRows = JobSession.arg(args, 1, 24000000L)
    val m          = JobSession.arg(args, 2, 10L).toInt
    val srs = Seq(5, 10, 15, 20)

    val adult = Tables.setupAdult(spark, adultRows, Storage.Parquet())
    val amazon = Tables.setupAmazon(spark, amazonRows, Storage.Parquet())
    val rows =
      Tables.samplingRateAnalysis(adult, "Adult", Datasets.adultDims, srs, m) ++
      Tables.samplingRateAnalysis(amazon, "Amazon", Datasets.amazonDims, srs, m)
    println("== Figure 5: sampling-rate-based analysis ==")
    println(Tables.fmt(rows, Seq("dataset", "sr%", "agg", "avgRelErr", "avgSpeedup")))
    spark.stop()
  }
}
