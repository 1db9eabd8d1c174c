package repro.jobs

import repro.data.Datasets
import repro.federation.Storage
import repro.harness.Tables

/** Figure 4 + Figure 7 (dimension axis): relative error and speed-up vs the
  * number of query dimensions. Args: [adultRows] [amazonRows] [m].
  */
object RunDimensionAnalysis {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("repro-dimension-analysis")
    val adultRows  = JobSession.arg(args, 0, 1600000L)
    val amazonRows = JobSession.arg(args, 1, 24000000L)
    val m          = JobSession.arg(args, 2, 10L).toInt

    val adult = Tables.setupAdult(spark, adultRows, Storage.Parquet())
    val amazon = Tables.setupAmazon(spark, amazonRows, Storage.Parquet())
    val rows =
      Tables.dimensionAnalysis(adult, "Adult", Datasets.adultDims, 2 to 6, m, sr = 0.20) ++
      Tables.dimensionAnalysis(amazon, "Amazon", Datasets.amazonDims, 2 to 5, m, sr = 0.05)
    println("== Figure 4/7: dimension-based analysis ==")
    println(Tables.fmt(rows, Seq("dataset", "n", "agg", "avgRelErr", "avgSpeedup")))
    spark.stop()
  }
}
