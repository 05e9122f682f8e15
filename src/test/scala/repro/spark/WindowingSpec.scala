package repro.spark

import repro.SparkSpec
import repro.core.PaneResult
import repro.query._

/** DataFrame window roll-up: pane results → WITHIN/SLIDE window results
  * per query, with the final value derived per aggregate.
  */
class WindowingSpec extends SparkSpec {

  private def pr(q: String, grp: String, pane: Long, c: Double, n: Double = 0,
                 s: Double = 0, mn: Double = Double.PositiveInfinity,
                 mx: Double = Double.NegativeInfinity) =
    PaneResult(q, grp, pane, c, n, s, mn, mx)

  private def collect(wl: CompiledWorkload, rows: Seq[PaneResult]): Map[(String, String, Long), Option[Double]] = {
    import spark.implicits._
    BatchRunner.windowed(spark, wl, spark.createDataset(rows))
      .collect()
      .map(r => (r.getAs[String]("queryId"), r.getAs[String]("grp"), r.getAs[Long]("windowInstance")) ->
        Option(r.getAs[java.lang.Double]("value")).map(_.doubleValue()))
      .toMap
  }

  test("tumbling window (w = s) sums its panes") {
    val wl = Workload.compile(Seq(TrendQuery("q", Pattern.seq("A", "B+"), window = QueryWindow(4, 4))))
    // pane = 4 min -> windowPanes = 1: each pane is its own window.
    val out = collect(wl, Seq(pr("q", "g", 0, 3), pr("q", "g", 1, 5)))
    assert(out((("q"), "g", 0L)).contains(3.0))
    assert(out((("q"), "g", 1L)).contains(5.0))
  }

  test("sliding window: every pane lands in w/s instances") {
    val wl = Workload.compile(Seq(TrendQuery("q", Pattern.seq("A", "B+"), window = QueryWindow(4, 2))))
    // windowPanes = 2, slidePanes = 1: instance i covers panes {i, i+1}.
    val out = collect(wl, Seq(pr("q", "g", 0, 1), pr("q", "g", 1, 10), pr("q", "g", 2, 100)))
    assert(out((("q"), "g", 0L)).contains(11.0))  // panes 0,1
    assert(out((("q"), "g", 1L)).contains(110.0)) // panes 1,2
    assert(out((("q"), "g", 2L)).contains(100.0)) // pane 2 (open tail)
  }

  test("AVG derives from summed S and N channels") {
    val wl = Workload.compile(Seq(
      TrendQuery("q", Pattern.seq("A", "B+"), Agg.Avg("B", "v"), window = QueryWindow(4, 4))))
    val out = collect(wl, Seq(pr("q", "g", 0, 2, n = 4, s = 10), pr("q", "g", 1, 2, n = 2, s = 8)))
    assert(out((("q"), "g", 0L)).contains(2.5))
    assert(out((("q"), "g", 1L)).contains(4.0))
  }

  test("MIN/MAX combine across panes; empty combines yield null") {
    val wl = Workload.compile(Seq(
      TrendQuery("mn", Pattern.seq("A", "B+"), Agg.Min("B", "v"), window = QueryWindow(8, 4)),
      TrendQuery("mx", Pattern.seq("A", "B+"), Agg.Max("B", "v"), window = QueryWindow(8, 4))))
    val rows = Seq(
      pr("mn", "g", 0, 1, mn = 5), pr("mn", "g", 1, 1, mn = 3),
      pr("mx", "g", 0, 1, mx = 7), pr("mx", "g", 1, 1, mx = 9),
      pr("mn", "h", 0, 0), // no trend: mn stays +inf -> null value
    )
    val out = collect(wl, rows)
    assert(out((("mn"), "g", 0L)).contains(3.0))
    assert(out((("mx"), "g", 0L)).contains(9.0))
    assert(out((("mn"), "h", 0L)).isEmpty)
  }

  test("queries with different windows roll up independently") {
    val wl = Workload.compile(Seq(
      TrendQuery("a", Pattern.seq("A", "B+"), window = QueryWindow(4, 2)),
      TrendQuery("b", Pattern.seq("C", "B+"), window = QueryWindow(8, 2))))
    // pane = 2 min; "a": 2 panes/window, "b": 4 panes/window.
    val rows = (0 until 4).flatMap(p => Seq(pr("a", "g", p.toLong, 1), pr("b", "g", p.toLong, 1)))
    val out = collect(wl, rows)
    assert(out((("a"), "g", 0L)).contains(2.0))
    assert(out((("b"), "g", 0L)).contains(4.0))
  }
}
