package repro.jobs

import repro.harness.Experiments

/** Figures 9/10: Hamlet vs MCEP vs Greta vs Sharon on the Ridesharing
  * stream (latency, throughput, peak memory).
  *
  * Usage: spark-submit --class repro.jobs.RidesharingComparisonJob repro.jar
  *        [minutes] [epmCsv] [kCsv]
  */
object RidesharingComparisonJob {
  def main(args: Array[String]): Unit = {
    val minutes = args.lift(0).map(_.toInt).getOrElse(4)
    val epms = args.lift(1).map(_.split(',').toSeq.map(_.toInt)).getOrElse(Seq(10_000, 20_000))
    val ks = args.lift(2).map(_.split(',').toSeq.map(_.toInt)).getOrElse(Seq(5, 15, 25))
    val rows = Experiments.fig9(minutes, epms, ks)
    Experiments.printComparison("Figures 9/10 — Hamlet vs state-of-the-art (Ridesharing)", rows)
  }
}
