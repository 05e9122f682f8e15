package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.harness.{BenchHarness, Experiments}

/** Figure 9 (a–d): latency and throughput of Hamlet vs MCEP vs Greta vs
  * Sharon on the Ridesharing stream, varying events/min and queries.
  * Result equality across engines is asserted inside Experiments.fig9.
  */
class Fig9StateOfTheArtBench extends AnyFunSuite {

  private lazy val rows = BenchCache.fig9

  test("print Figure 9 latency/throughput table") {
    Experiments.printComparison("Figure 9 — Hamlet vs state-of-the-art (Ridesharing)", rows)
    BenchHarness.printTable("Figure 9 — speedups over HAMLET (same setting)",
      Seq("ev/min", "queries", "engine", "latency ratio", "throughput ratio"),
      rows.groupBy(r => (r.evPerMin, r.k)).toSeq.sortBy(_._1).flatMap { case ((epm, k), rs) =>
        val h = rs.find(_.res.name == "HAMLET").get
        rs.filter(_.res.name != "HAMLET").map { r =>
          Seq(epm.toString, k.toString, r.res.name,
            BenchHarness.fmtD(r.res.latencyMs / h.res.latencyMs),
            BenchHarness.fmtD(h.res.throughputEps / r.res.throughputEps))
        }
      })
    assert(rows.nonEmpty)
  }

  test("Hamlet outperforms every baseline on latency and throughput") {
    rows.groupBy(r => (r.evPerMin, r.k)).foreach { case (key, rs) =>
      val h = rs.find(_.res.name == "HAMLET").get
      rs.filter(_.res.name != "HAMLET").foreach { r =>
        assert(h.res.latencyMs < r.res.latencyMs, s"$key ${r.res.name}")
        assert(h.res.throughputEps > r.res.throughputEps, s"$key ${r.res.name}")
      }
    }
  }

  test("the ordering of the paper holds: Sharon is the slowest baseline") {
    rows.groupBy(r => (r.evPerMin, r.k)).foreach { case (key, rs) =>
      val sharon = rs.find(_.res.name == "SHARON").get
      val greta = rs.find(_.res.name == "GRETA").get
      assert(sharon.res.latencyMs > greta.res.latencyMs, s"$key")
    }
  }

  test("no baseline hit its safety cap (results are exact)") {
    assert(rows.forall(!_.res.truncated))
  }
}
