package repro.jobs

import repro.harness.Experiments

/** Figure 11: Hamlet vs Greta on NYC-Taxi-like and Smart-Home-like
  * streams with overlapping windows.
  *
  * Usage: spark-submit --class repro.jobs.RealDataComparisonJob repro.jar
  *        [taxiEpmCsv] [shEpmCsv] [kCsv]
  */
object RealDataComparisonJob {
  def main(args: Array[String]): Unit = {
    val taxiE = args.lift(0).map(_.split(',').toSeq.map(_.toInt)).getOrElse(Seq(100, 200, 400))
    val shE = args.lift(1).map(_.split(',').toSeq.map(_.toInt)).getOrElse(Seq(5_000, 10_000, 20_000))
    val ks = args.lift(2).map(_.split(',').toSeq.map(_.toInt)).getOrElse(Seq(10, 30, 50))
    val rows = Experiments.fig11(taxiE, shE, ks)
    Experiments.printComparison("Figure 11 — Hamlet vs Greta (NYC-Taxi, Smart-Home)", rows)
  }
}
