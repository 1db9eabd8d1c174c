package repro.jobs

import repro.harness.Tables

/** Table 1: NBC learning-attack accuracy vs total budget ξ under
  * sequential / advanced / coalition composition. Args: [rows].
  */
object RunAttack {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("repro-attack")
    val rows = JobSession.arg(args, 0, 100000L)

    val (results, control, majority) =
      Tables.attackAnalysis(spark, rows, xis = Seq(1.0, 20.0, 50.0, 100.0))
    println("== Table 1: inference accuracy based on xi ==")
    println(f"no-privacy control (exact answers): accuracy = ${control * 100}%.2f%%; " +
      f"majority-class baseline: ${majority * 100}%.2f%%")
    println(Tables.fmt(results, Seq("composition", "agg", "xi", "accuracy", "perQueryEps")))
    spark.stop()
  }
}
