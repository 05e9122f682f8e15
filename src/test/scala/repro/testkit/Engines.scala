package repro.testkit

import repro.baselines.{McepEngine, SharonEngine}
import repro.core.PaneAgg
import repro.events.Event
import repro.hamlet._
import repro.metrics.Metrics
import repro.query.{CompiledWorkload, TrendQuery, Workload}

/** Thin test facade: run every implementation over a single-pane event
  * sequence and return per-query aggregates.
  */
object Engines {

  def compile(qs: Seq[TrendQuery]): CompiledWorkload = Workload.compile(qs)

  def hamlet(qs: Seq[TrendQuery], events: Seq[Event], policy: SharingPolicy,
             metrics: Metrics = new Metrics): Map[String, PaneAgg] =
    new HamletExecutor(compile(qs), policy).processPaneAggs(events, metrics)

  def greta(qs: Seq[TrendQuery], events: Seq[Event],
            metrics: Metrics = new Metrics): Map[String, PaneAgg] =
    GretaEngine.processPane(compile(qs).queries, events, metrics)

  def mcep(qs: Seq[TrendQuery], events: Seq[Event]): Map[String, PaneAgg] =
    McepEngine.processPane(compile(qs).queries, events, new Metrics).aggs

  def sharon(qs: Seq[TrendQuery], events: Seq[Event], maxLen: Int = 512): Map[String, PaneAgg] = {
    val out = SharonEngine.processPane(compile(qs).queries, events, new Metrics, maxLen)
    require(!out.truncated, "Sharon flattening truncated in a correctness test")
    out.aggs
  }

  def brute(qs: Seq[TrendQuery], events: Seq[Event]): Map[String, PaneAgg] = {
    val wl = compile(qs)
    wl.queries.map(q => q.id -> BruteForce.aggs(q, events.toIndexedSeq)).toMap
  }

  def assertSame(a: Map[String, PaneAgg], b: Map[String, PaneAgg], hint: String = ""): Unit = {
    assert(a.keySet == b.keySet, s"$hint query sets differ")
    a.keySet.foreach { q =>
      val (x, y) = (a(q), b(q))
      def close(u: Double, v: Double) =
        (u.isInfinite && v.isInfinite && u == v) ||
          math.abs(u - v) <= 1e-6 * math.max(1.0, math.max(math.abs(u), math.abs(v)))
      assert(close(x.c, y.c) && close(x.n, y.n) && close(x.s, y.s) &&
             close(x.mn, y.mn) && close(x.mx, y.mx),
        s"$hint query $q: $x vs $y")
    }
  }
}
