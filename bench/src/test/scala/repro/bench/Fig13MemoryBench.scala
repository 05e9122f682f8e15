package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.harness.BenchHarness

/** Figure 13 (a–b): peak memory of dynamic vs static sharing on the
  * Figure 12 runs. Paper shape: dynamic reduces memory (~25%) because it
  * maintains far fewer snapshots.
  */
class Fig13MemoryBench extends AnyFunSuite {

  private lazy val rows = BenchCache.fig12

  /** The paper's memory metric counts stored snapshot expressions and
    * values over the execution ("maximal memory required to store snapshot
    * expressions", §6.1); our engines free a pane's snapshot table when its
    * graphlet closes, so the comparable quantity adds the lifetime
    * snapshot-value storage (snapshots × queries × 8 B) to the live peak.
    */
  private def memModel(r: repro.harness.Experiments.Row): Long =
    r.res.peakBytes + r.res.metrics.snapshotsCreated * r.k * 8L

  test("print Figure 13 memory table") {
    BenchHarness.printTable("Figure 13 — peak memory, dynamic vs static (Stock)",
      Seq("ev/min", "queries", "engine", "live peak bytes", "snapshot bytes", "total bytes"),
      rows.groupBy(r => (r.evPerMin, r.k)).toSeq.sortBy(_._1).flatMap { case ((epm, k), rs) =>
        rs.map { r =>
          Seq(epm.toString, k.toString, r.res.name, r.res.peakBytes.toString,
            (r.res.metrics.snapshotsCreated * r.k * 8L).toString, memModel(r).toString)
        }
      })
    assert(rows.nonEmpty)
  }

  test("dynamic needs less snapshot-inclusive memory than static") {
    rows.groupBy(r => (r.evPerMin, r.k)).foreach { case (key, rs) =>
      val d = memModel(rs.find(_.res.name == "HAMLET-dynamic").get)
      val s = memModel(rs.find(_.res.name == "HAMLET-static").get)
      assert(d < s, s"$key dyn=$d static=$s")
    }
  }
}
