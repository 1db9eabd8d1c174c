package repro.jobs

import repro.harness.Tables

/** Figure 1: runtime cost of SMC row sharing vs result sharing.
  * Args: [maxRows].
  */
object RunRowSharingSim {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("repro-row-sharing-sim")
    val maxRows = JobSession.arg(args, 0, 1600000L)
    val sizes = Seq(maxRows / 8, maxRows / 4, maxRows / 2, maxRows)

    val rows = Tables.rowSharingSimulation(spark, sizes)
    println("== Figure 1: SMC row sharing vs result sharing ==")
    println(Tables.fmt(rows, Seq("rows", "rowSharingMs", "resultSharingMs", "ratio")))
    spark.stop()
  }
}
