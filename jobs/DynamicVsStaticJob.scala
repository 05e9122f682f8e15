package repro.jobs

import repro.harness.Experiments

/** Figures 12/13: dynamic vs static sharing decisions on the Stock stream
  * (latency, throughput, memory, snapshot counts, decision overhead).
  *
  * Usage: spark-submit --class repro.jobs.DynamicVsStaticJob repro.jar
  *        [minutes] [epmCsv] [kCsv]
  */
object DynamicVsStaticJob {
  def main(args: Array[String]): Unit = {
    val minutes = args.lift(0).map(_.toInt).getOrElse(8)
    val epms = args.lift(1).map(_.split(',').toSeq.map(_.toInt)).getOrElse(Seq(2_000, 3_000, 4_000))
    val ks = args.lift(2).map(_.split(',').toSeq.map(_.toInt)).getOrElse(Seq(20, 60, 100))
    val rows = Experiments.fig12(minutes, epms, ks)
    Experiments.printComparison("Figures 12/13 — dynamic vs static sharing (Stock)", rows)
  }
}
