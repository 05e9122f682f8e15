package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.harness.{BenchHarness, Experiments}

/** Figure 12 (a–d): dynamic vs static sharing decisions on the Stock
  * stream (workload 2, regime-flipping predicate divergence). Paper shape:
  * 21–34% latency speed-up, 27–52% throughput improvement for dynamic,
  * ~90% of bursts shared, snapshot count roughly halved; decision overhead
  * under 0.2% of latency.
  */
class Fig12DynamicVsStaticBench extends AnyFunSuite {

  private lazy val rows = BenchCache.fig12

  test("print Figure 12 latency/throughput table") {
    Experiments.printComparison("Figure 12 — dynamic vs static sharing (Stock)", rows)
    BenchHarness.printTable("Figure 12 — dynamic gains over static",
      Seq("ev/min", "queries", "latency speedup %", "throughput gain %",
          "snapshots dyn/static", "bursts shared dyn %"),
      rows.groupBy(r => (r.evPerMin, r.k)).toSeq.sortBy(_._1).map { case ((epm, k), rs) =>
        val d = rs.find(_.res.name == "HAMLET-dynamic").get.res
        val s = rs.find(_.res.name == "HAMLET-static").get.res
        Seq(epm.toString, k.toString,
          BenchHarness.fmtD((1 - d.latencyMs / s.latencyMs) * 100),
          BenchHarness.fmtD((d.throughputEps / s.throughputEps - 1) * 100),
          s"${d.metrics.snapshotsCreated}/${s.metrics.snapshotsCreated}",
          BenchHarness.fmtD(100.0 * d.metrics.sharedBursts / math.max(1, d.metrics.totalBursts)))
      })
    assert(rows.nonEmpty)
  }

  test("dynamic creates fewer snapshots than static everywhere") {
    rows.groupBy(r => (r.evPerMin, r.k)).foreach { case (key, rs) =>
      val d = rs.find(_.res.name == "HAMLET-dynamic").get.res.metrics
      val s = rs.find(_.res.name == "HAMLET-static").get.res.metrics
      assert(d.snapshotsCreated < s.snapshotsCreated, s"$key")
    }
  }

  test("dynamic shares most bursts but not all (fine-grained decisions)") {
    rows.filter(_.res.name == "HAMLET-dynamic").foreach { r =>
      val m = r.res.metrics
      val ratio = m.sharedBursts.toDouble / math.max(1, m.totalBursts)
      assert(ratio > 0.3 && ratio < 1.0, s"${r.evPerMin}/${r.k}: $ratio")
    }
  }

  test("dynamic is at least as fast as static (and beats no-sharing overall)") {
    rows.groupBy(r => (r.evPerMin, r.k)).foreach { case (key, rs) =>
      val d = rs.find(_.res.name == "HAMLET-dynamic").get.res
      val s = rs.find(_.res.name == "HAMLET-static").get.res
      val n = rs.find(_.res.name == "No-sharing").get.res
      assert(d.wallMs <= s.wallMs * 1.10, s"$key dyn=${d.wallMs} static=${s.wallMs}")
      // Per setting, allow wall-clock jitter around parity with the
      // non-shared executor (with few queries the sharing benefit is
      // small and decision overhead shows — Definition 12).
      assert(d.wallMs < n.wallMs * 1.5, s"$key dyn=${d.wallMs} none=${n.wallMs}")
    }
    // In aggregate over the sweep, adaptive sharing must win.
    def total(name: String) =
      rows.filter(_.res.name == name).map(_.res.wallMs).sum
    assert(total("HAMLET-dynamic") < total("No-sharing"))
    assert(total("HAMLET-dynamic") < total("HAMLET-static"))
  }

  test("§6.2 overhead: decisions are light-weight relative to execution") {
    rows.filter(_.res.name == "HAMLET-dynamic").foreach { r =>
      val m = r.res.metrics
      val frac = m.decisionNanos.toDouble / math.max(1L, m.wallNanos)
      assert(frac < 0.25, s"${r.evPerMin}/${r.k}: decision fraction $frac")
      assert(m.decisions == m.totalBursts)
      assert(m.plansExamined >= m.decisions) // m+1 plans per decision
    }
  }
}
