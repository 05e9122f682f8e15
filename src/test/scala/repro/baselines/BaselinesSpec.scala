package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

import repro.events.Event
import repro.metrics.Metrics
import repro.query._
import repro.testkit.{Engines, TestGen}

/** The two-step (MCEP-style) and flattened (Sharon-style) baselines must
  * produce the same results as the online engines — the paper's comparison
  * is about cost, not semantics.
  */
class BaselinesSpec extends AnyFunSuite {

  private def ev(id: Long, typ: String, v: Double = 0.0): Event =
    Event(id, id * 10, typ, "g", Map("v" -> v))

  test("MCEP: hand case A B B has three trends") {
    val q = TrendQuery("q", Pattern.seq("A", "B+"), window = QueryWindow(4, 2))
    assert(Engines.mcep(Seq(q), Seq(ev(0, "A"), ev(1, "B"), ev(2, "B")))(q.id).c == 3.0)
  }

  test("MCEP: shared construction serves multiple queries in one pass") {
    val qs = Seq(
      TrendQuery("q1", Pattern.seq("A", "B+"), window = QueryWindow(4, 2)),
      TrendQuery("q2", Pattern.seq("C", "B+"), window = QueryWindow(4, 2)))
    val events = Seq(ev(0, "A"), ev(1, "A"), ev(2, "C"), ev(3, "B"))
    val out = Engines.mcep(qs, events)
    assert(out("q1").c == 2.0 && out("q2").c == 1.0) // Example 4
  }

  test("MCEP: visit cap reports truncation") {
    val q = TrendQuery("q", Pattern.seq("B+"), window = QueryWindow(4, 2))
    val events = (0 until 30).map(i => ev(i.toLong, "B"))
    val out = McepEngine.processPane(Engines.compile(Seq(q)).queries, events, new Metrics, maxVisits = 100)
    assert(out.truncated)
  }

  test("MCEP: two-step aggregates from materialized trends (SUM)") {
    val q = TrendQuery("q", Pattern.seq("A", "B+"), Agg.Sum("B", "v"), window = QueryWindow(4, 2))
    val events = Seq(ev(0, "A"), ev(1, "B", 3), ev(2, "B", 10))
    assert(Engines.mcep(Seq(q), events)(q.id).s == 26.0)
  }

  test("Sharon: flattening covers every length (A B B B = 7 trends)") {
    val q = TrendQuery("q", Pattern.seq("A", "B+"), window = QueryWindow(4, 2))
    val events = Seq(ev(0, "A"), ev(1, "B"), ev(2, "B"), ev(3, "B"))
    assert(Engines.sharon(Seq(q), events)(q.id).c == 7.0)
  }

  test("Sharon: flatten-length cap reports truncation") {
    val q = TrendQuery("q", Pattern.seq("A", "B+"), window = QueryWindow(4, 2))
    val events = ev(0, "A") +: (1 to 10).map(i => ev(i.toLong, "B"))
    val out = SharonEngine.processPane(Engines.compile(Seq(q)).queries, events, new Metrics, maxLen = 3)
    assert(out.truncated)
  }

  test("Sharon rejects patterns it cannot flatten (nested Kleene)") {
    val q = TrendQuery("q", PKleene(PSeq(List(PEvent("A"), PKleene(PEvent("B"))))),
      window = QueryWindow(4, 2))
    intercept[IllegalArgumentException] {
      SharonEngine.processPane(Engines.compile(Seq(q)).queries, Seq(ev(0, "A")), new Metrics)
    }
  }

  for (seed <- 0 until 20) {
    test(s"MCEP equals brute force on random workloads (seed $seed)") {
      val rnd = new Random(1000 + seed)
      val events = TestGen.stream(rnd, 12 + rnd.nextInt(6))
      val qs = TestGen.randomWorkload(rnd, 1 + rnd.nextInt(3))
      Engines.assertSame(Engines.mcep(qs, events), Engines.brute(qs, events), s"seed=$seed")
    }
  }

  for (seed <- 0 until 20) {
    test(s"Sharon equals brute force on flattenable workloads (seed $seed)") {
      val rnd = new Random(2000 + seed)
      val events = TestGen.stream(rnd, 12 + rnd.nextInt(6))
      // Sharon supports neither edge predicates nor nested Kleene; draw
      // from the flattenable pool.
      val qs = (0 until 1 + rnd.nextInt(3)).map { i =>
        val q = Iterator.continually(TestGen.randomQuery(rnd, s"q$i"))
          .dropWhile(_.edgePred.isDefined).next()
        q
      }
      Engines.assertSame(Engines.sharon(qs, events), Engines.brute(qs, events), s"seed=$seed")
    }
  }

  test("Sharon cost grows with flatten length (the paper's Sharon bottleneck)") {
    val q = TrendQuery("q", Pattern.seq("A", "B+"), window = QueryWindow(4, 2))
    val cq = Engines.compile(Seq(q)).queries
    def ops(n: Int): Long = {
      val m = new Metrics
      SharonEngine.processPane(cq, ev(0, "A") +: (1 to n).map(i => ev(i.toLong, "B")), m, maxLen = 512)
      m.evalOps
    }
    val (small, large) = (ops(10), ops(40))
    assert(large > 8 * small) // superlinear (≈ quadratic in burst length)
  }
}
