package repro.jobs

import repro.data.Datasets
import repro.federation.Storage
import repro.harness.Tables

/** Figure 6 + Figure 7 (ε axis): relative error and speed-up vs privacy
  * budget. Args: [adultRows] [amazonRows] [m].
  */
object RunEpsilonAnalysis {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("repro-epsilon-analysis")
    val adultRows  = JobSession.arg(args, 0, 1600000L)
    val amazonRows = JobSession.arg(args, 1, 24000000L)
    val m          = JobSession.arg(args, 2, 10L).toInt
    val epss = Seq(0.1, 0.4, 0.7, 1.0, 1.3)

    val adult = Tables.setupAdult(spark, adultRows, Storage.Parquet())
    val amazon = Tables.setupAmazon(spark, amazonRows, Storage.Parquet())
    val rows =
      Tables.epsilonAnalysis(adult, "Adult", Datasets.adultDims, epss, m, sr = 0.10) ++
      Tables.epsilonAnalysis(amazon, "Amazon", Datasets.amazonDims, epss, m, sr = 0.05)
    println("== Figure 6/7: privacy-budget-based analysis ==")
    println(Tables.fmt(rows, Seq("dataset", "eps", "agg", "avgRelErr", "avgSpeedup")))
    spark.stop()
  }
}
