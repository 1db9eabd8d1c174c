package repro.jobs

import repro.data.Datasets
import repro.federation.Storage
import repro.harness.Tables

/** Figure 8: SMC-released vs locally-noised answers — realized noise range
  * and speed-up. Args: [adultRows] [iters].
  */
object RunSmcVsDp {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("repro-smc-vs-dp")
    val adultRows = JobSession.arg(args, 0, 1600000L)
    val iters     = JobSession.arg(args, 1, 5L).toInt

    val adult = Tables.setupAdult(spark, adultRows, Storage.Parquet())
    val rows = Tables.smcVsDp(adult, Datasets.adultDims, iters = iters)
    println("== Figure 8: SMC effect on speed-up and accuracy ==")
    println(Tables.fmt(rows,
      Seq("query", "mode", "|noise|min", "|noise|max", "avgRelErr", "avgSpeedup")))
    spark.stop()
  }
}
