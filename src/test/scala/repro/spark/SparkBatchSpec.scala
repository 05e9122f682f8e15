package repro.spark

import scala.util.Random

import repro.{Oracle, SparkSpec}
import repro.events.Event
import repro.hamlet.{AlwaysShare, Dynamic, NeverShare}
import repro.metrics.Metrics
import repro.query._
import repro.testkit.{Engines, TrendSql}

/** The Dataset-based runner: results must match the direct engine calls,
  * and — via the DuckDB recursive-CTE path-counting oracle — the SQL
  * definition of trend counting.
  */
class SparkBatchSpec extends SparkSpec {

  private def mkEvents(seed: Int, n: Int, groups: Int, panes: Int, paneMs: Long): Vector[Event] = {
    val rnd = new Random(seed)
    val types = Vector("A", "B", "C", "D")
    (0 until n).toVector.map { i =>
      Event(i.toLong, rnd.nextLong(paneMs * panes).abs, types(rnd.nextInt(types.size)),
        s"g${rnd.nextInt(groups)}", Map("v" -> rnd.nextInt(100).toDouble))
    }.sortBy(e => (e.ts, e.id)).zipWithIndex.map { case (e, i) => e.copy(id = i.toLong) }
  }

  private val w42 = QueryWindow(4, 2)

  test("toDS round-trips events including attribute maps") {
    val events = mkEvents(1, 50, 3, 2, 120_000L)
    val ds = BatchRunner.toDS(spark, events)
    assert(ds.collect().toVector.sortBy(_.id) == events)
  }

  test("paneResults equals direct executor output across groups and panes") {
    val qs = Seq(
      TrendQuery("q1", Pattern.seq("A", "B+"), window = w42),
      TrendQuery("q2", Pattern.seq("C", "B+"), window = w42))
    val wl = Workload.compile(qs)
    val events = mkEvents(2, 120, 4, 3, wl.paneMs)
    val got = BatchRunner
      .paneResults(spark, wl, Dynamic(), BatchRunner.toDS(spark, events))
      .collect().toVector
      .map(r => (r.queryId, r.grp, r.pane) -> r.c).toMap

    val exec = new repro.hamlet.HamletExecutor(wl, Dynamic())
    val expected = events.groupBy(e => (e.grp, e.pane(wl.paneMs))).flatMap {
      case ((g, p), evs) =>
        exec.processPane(g, p, evs.sortBy(e => (e.ts, e.id)), new Metrics)
          .map(r => (r.queryId, r.grp, r.pane) -> r.c)
    }
    assert(got == expected)
  }

  test("policies agree through the Spark runner") {
    val qs = Seq(
      TrendQuery("q1", Pattern.seq("A", "B+"), preds = Seq(NumPred("B", "v", ">", 40)), window = w42),
      TrendQuery("q2", Pattern.seq("C", "B+"), window = w42))
    val wl = Workload.compile(qs)
    val events = mkEvents(3, 150, 3, 3, wl.paneMs)
    val ds = BatchRunner.toDS(spark, events)
    def sums(p: repro.hamlet.SharingPolicy) =
      BatchRunner.paneResults(spark, wl, p, ds).collect()
        .map(r => (r.queryId, r.grp, r.pane) -> r.c).toMap
    val never = sums(NeverShare)
    assert(sums(AlwaysShare) == never)
    assert(sums(Dynamic()) == never)
  }

  // ---- DuckDB oracle: trend counting as recursive path counting ------
  private def oracleCheck(q: TrendQuery, seed: Int, n: Int = 60): Unit = {
    val wl = Workload.compile(Seq(q))
    val events = mkEvents(seed, n, 3, 2, wl.paneMs)
    val cq = wl.byId(q.id)
    val sparkDf = {
      import spark.implicits._
      BatchRunner.paneResults(spark, wl, Dynamic(), BatchRunner.toDS(spark, events))
        .filter(_.c > 0.0)
        .select($"grp", $"pane", $"c")
    }
    Oracle.assertEquivalent(
      sparkDf,
      TrendSql.countSql(cq),
      "events" -> TrendSql.eventsDf(spark, events, wl.paneMs, numAttrs = Seq("v")),
      "trans" -> TrendSql.transitionsDf(spark, cq),
    )
  }

  test("oracle: SEQ(A, B+)") { oracleCheck(TrendQuery("q", Pattern.seq("A", "B+"), window = w42), 10) }

  test("oracle: bare Kleene B+") {
    oracleCheck(TrendQuery("q", Pattern.seq("B+"), window = w42), 11, n = 30)
  }

  test("oracle: SEQ(A, B+, C)") {
    oracleCheck(TrendQuery("q", Pattern.seq("A", "B+", "C"), window = w42), 12)
  }

  test("oracle: predicate on the Kleene type") {
    oracleCheck(TrendQuery("q", Pattern.seq("A", "B+"),
      preds = Seq(NumPred("B", "v", ">", 35)), window = w42), 13)
  }

  test("oracle: trailing negation SEQ(A, B+, NOT D)") {
    oracleCheck(TrendQuery("q", Pattern.seq("A", "B+", "!D"), window = w42), 14)
  }

  test("oracle: mid negation SEQ(A, NOT C, B+)") {
    oracleCheck(TrendQuery("q", Pattern.seq("A", "!C", "B+"), window = w42), 15)
  }

  test("oracle: mid negation after Kleene SEQ(A, B+, NOT C, D)") {
    oracleCheck(TrendQuery("q", Pattern.seq("A", "B+", "!C", "D"), window = w42), 16)
  }

  test("oracle: predicates on multiple types") {
    oracleCheck(TrendQuery("q", Pattern.seq("A", "B+"),
      preds = Seq(NumPred("B", "v", ">", 20), NumPred("A", "v", "<", 80)), window = w42), 17)
  }

  for (seed <- 20 until 26) {
    test(s"oracle: randomized multi-pane multi-group run (seed $seed)") {
      oracleCheck(TrendQuery("q", Pattern.seq("A", "B+"),
        preds = if (seed % 2 == 0) Seq(NumPred("B", "v", ">", 50)) else Nil,
        window = w42), seed, n = 80)
    }
  }
}
