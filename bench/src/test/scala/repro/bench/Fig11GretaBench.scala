package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.harness.{BenchHarness, Experiments}

/** Figure 11 (a–d): Hamlet vs Greta on the NYC-Taxi-like and
  * Smart-Home-like streams with strongly overlapping windows — the high
  * setting where only the online engines survive. Paper shape: 3–5 orders
  * of magnitude latency/throughput advantage for Hamlet.
  */
class Fig11GretaBench extends AnyFunSuite {

  private lazy val rows = BenchCache.fig11

  test("print Figure 11 latency/throughput table") {
    Experiments.printComparison("Figure 11 — Hamlet vs Greta (NYC-Taxi, Smart-Home)", rows)
    BenchHarness.printTable("Figure 11 — Hamlet speedup over Greta",
      Seq("dataset", "ev/min", "queries", "latency ratio", "throughput ratio"),
      rows.groupBy(r => (r.dataset, r.evPerMin, r.k)).toSeq.sortBy(_._1).map { case ((ds, epm, k), rs) =>
        val h = rs.find(_.res.name == "HAMLET").get
        val g = rs.find(_.res.name == "GRETA").get
        Seq(ds, epm.toString, k.toString,
          BenchHarness.fmtD(g.res.latencyMs / h.res.latencyMs),
          BenchHarness.fmtD(h.res.throughputEps / g.res.throughputEps))
      })
    assert(rows.nonEmpty)
  }

  test("Hamlet beats Greta by orders of magnitude at the default setting") {
    rows.groupBy(r => (r.dataset, r.evPerMin, r.k)).foreach { case (key, rs) =>
      val h = rs.find(_.res.name == "HAMLET").get
      val g = rs.find(_.res.name == "GRETA").get
      val speedup = g.res.latencyMs / h.res.latencyMs
      assert(speedup > 5.0, s"$key speedup=$speedup") // conservative floor
    }
  }

  test("the gap grows with the number of queries (sharing dimension)") {
    val byK = rows.filter(r => r.dataset == "NYC-Taxi" && r.evPerMin == 200)
      .groupBy(_.k).view.mapValues { rs =>
        rs.find(_.res.name == "GRETA").get.res.latencyMs /
          rs.find(_.res.name == "HAMLET").get.res.latencyMs
      }.toMap
    if (byK.size >= 2) {
      val ks = byK.keys.toSeq.sorted
      assert(byK(ks.last) > byK(ks.head), s"$byK")
    }
  }
}
