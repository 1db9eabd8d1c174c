package repro.jobs

import scala.util.Random

import repro.core._
import repro.data.Datasets
import repro.dp.Laplace
import repro.federation._
import repro.harness.Tables

/** Diagnostic: per-phase timing of Federation.run at bench scale. */
object DiagRun {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("repro-diag-run")
    val rows = if (args.nonEmpty) args(0).toLong else 12000000L
    val setup = Tables.setupAmazon(spark, rows, Storage.Parquet())
    val fed = setup.federation
    val qs = Datasets.qualifyingWorkload(fed, Datasets.amazonDims, 3, 4,
      Agg.Count, seed = 17L)

    for (q <- qs; sr <- Seq(0.05, 0.20)) {
      // warm
      fed.run(q, sr, 1.0, useSmc = false, seed = 1, exactBaseline = Some((0.0, 0.0)))
      val rng = new Random(2)
      val lap = new Laplace(rng)
      var t = System.nanoTime()
      val summaries = fed.providers.map(_.summary(q, 0.05, lap))
      val tSum = (System.nanoTime() - t) / 1e6
      t = System.nanoTime()
      val alloc = Allocation.allocate(summaries, sr)
      val plans = fed.providers.map(p => p.plan(q, alloc(p.providerId), 0.05, rng))
      val tPlan = (System.nanoTime() - t) / 1e6
      t = System.nanoTime()
      val sampled = plans.map(p => p.providerId -> (p.clusterIds: Seq[Int])).toMap
      val qc = setup.eval.perCluster(sampled, q)
      val tScan = (System.nanoTime() - t) / 1e6
      t = System.nanoTime()
      plans.foreach { pl =>
        val m = pl.clusterIds.iterator.map(c => c -> qc.getOrElse((pl.providerId, c), 0.0)).toMap
        fed.providers.find(_.providerId == pl.providerId).get.finish(q, pl, m, 0.8, 1e-3)
      }
      val tFin = (System.nanoTime() - t) / 1e6
      t = System.nanoTime()
      setup.eval.exactTotal(q)
      val tExact = (System.nanoTime() - t) / 1e6
      val nScan = plans.map(_.clusterIds.size).sum
      println(f"sr=$sr%4.2f scanned=$nScan%4d summaries=$tSum%7.1f plan=$tPlan%7.1f " +
        f"scan=$tScan%7.1f finish=$tFin%6.1f exact=$tExact%7.1f")
    }
    spark.stop()
  }
}
