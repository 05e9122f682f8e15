package repro.bench

import repro.harness.Experiments

/** Each figure's experiment runs once per bench JVM; the latency/throughput
  * and memory suites print different views of the same rows.
  */
object BenchCache {
  lazy val fig9: Seq[Experiments.Row] = Experiments.fig9()
  lazy val fig11: Seq[Experiments.Row] = Experiments.fig11()
  lazy val fig12: Seq[Experiments.Row] = Experiments.fig12()

  def by(rows: Seq[Experiments.Row], dataset: String, epm: Int, k: Int, engine: String): Experiments.Row =
    rows.find(r => r.dataset == dataset && r.evPerMin == epm && r.k == k && r.res.name == engine).get
}
