package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.harness.BenchHarness

/** Figure 10 (a–b): peak (modeled) memory of the four approaches on the
  * Figure 9 runs. Paper shape: Hamlet/Greta/MCEP similar, Sharon 2–3
  * orders of magnitude above.
  */
class Fig10MemoryBench extends AnyFunSuite {

  private lazy val rows = BenchCache.fig9

  test("print Figure 10 memory table") {
    BenchHarness.printTable("Figure 10 — peak memory (modeled bytes, Ridesharing)",
      Seq("ev/min", "queries", "engine", "peak bytes", "vs HAMLET"),
      rows.groupBy(r => (r.evPerMin, r.k)).toSeq.sortBy(_._1).flatMap { case ((epm, k), rs) =>
        val h = rs.find(_.res.name == "HAMLET").get
        rs.map { r =>
          Seq(epm.toString, k.toString, r.res.name, r.res.peakBytes.toString,
            BenchHarness.fmtD(r.res.peakBytes.toDouble / math.max(h.res.peakBytes, 1)))
        }
      })
    assert(rows.nonEmpty)
  }

  test("Sharon needs far more memory than Hamlet (flattened variants)") {
    rows.groupBy(r => (r.evPerMin, r.k)).foreach { case (key, rs) =>
      val h = rs.find(_.res.name == "HAMLET").get
      val s = rs.find(_.res.name == "SHARON").get
      assert(s.res.peakBytes > h.res.peakBytes, s"$key")
    }
  }
}
