package repro.general

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

import repro.events.Event
import repro.hamlet.{AlwaysShare, Dynamic, NeverShare}
import repro.query._
import repro.testkit.{Engines, TestGen}

/** §5 general trend aggregation queries running through the full executor:
  * nested Kleene, negation, and disjunction/conjunction by composition.
  */
class GeneralQueriesSpec extends AnyFunSuite {

  private def ev(id: Long, typ: String, v: Double = 0.0): Event =
    Event(id, id * 10, typ, "g", Map("v" -> v))

  private val policies = Seq(NeverShare, AlwaysShare, Dynamic())

  test("Example 10 workload: nested Kleene queries share B+ correctly") {
    val q1 = TrendQuery("q1", PKleene(PSeq(List(PEvent("A"), PKleene(PEvent("B"))))),
      window = QueryWindow(4, 2))
    val q2 = TrendQuery("q2", PKleene(PSeq(List(PEvent("C"), PKleene(PEvent("B"))))),
      window = QueryWindow(4, 2))
    val events = Seq(ev(0, "A"), ev(1, "C"), ev(2, "B"), ev(3, "B"),
      ev(4, "A"), ev(5, "C"), ev(6, "B"))
    val expected = Engines.brute(Seq(q1, q2), events)
    policies.foreach { p =>
      Engines.assertSame(Engines.hamlet(Seq(q1, q2), events, p), expected, s"$p")
    }
  }

  for (seed <- 0 until 10) {
    test(s"nested Kleene equivalence on random streams (seed $seed)") {
      val rnd = new Random(3000 + seed)
      val events = TestGen.stream(rnd, 10 + rnd.nextInt(5))
      val qs = Seq(
        TrendQuery("q1", PKleene(PSeq(List(PEvent("A"), PKleene(PEvent("B"))))), window = QueryWindow(4, 2)),
        TrendQuery("q2", Pattern.seq("C", "B+"), window = QueryWindow(4, 2)))
      val expected = Engines.brute(qs, events)
      policies.foreach(p => Engines.assertSame(Engines.hamlet(qs, events, p), expected, s"$seed/$p"))
    }
  }

  test("trailing negation invalidates earlier trends only (q1 of Figure 1 shape)") {
    val q = TrendQuery("q", Pattern.seq("R", "T+", "!P"), window = QueryWindow(4, 2))
    // r t t p t: trends must end after the P: (r,t1,t4),(r,t2,t4),(r,t1,t2,t4),(r,t4)
    val events = Seq(ev(0, "R"), ev(1, "T"), ev(2, "T"), ev(3, "P"), ev(4, "T"))
    assert(Engines.greta(Seq(q), events)(q.id).c == 4.0)
    Engines.assertSame(Engines.greta(Seq(q), events), Engines.brute(Seq(q), events))
  }

  test("trailing negation with a final matching event kills everything") {
    val q = TrendQuery("q", Pattern.seq("R", "T+", "!P"), window = QueryWindow(4, 2))
    val events = Seq(ev(0, "R"), ev(1, "T"), ev(2, "T"), ev(3, "P"))
    assert(Engines.greta(Seq(q), events)(q.id).c == 0.0)
  }

  test("predicated trailing negation only counts matching neg events") {
    val q = TrendQuery("q", Pattern.seq("R", "T+", "!P"),
      preds = Seq(NumPred("P", "v", ">", 50)), window = QueryWindow(4, 2))
    // P with v=10 does not match: trends survive.
    val events = Seq(ev(0, "R"), ev(1, "T"), ev(2, "P", 10))
    assert(Engines.greta(Seq(q), events)(q.id).c == 1.0)
  }

  test("mid negation blocks across the barrier only (SEQ(A, NOT C, B+))") {
    val q = TrendQuery("q", Pattern.seq("A", "!C", "B+"), window = QueryWindow(4, 2))
    // a c b: A before C cannot reach B. a2 after C can.
    val events = Seq(ev(0, "A"), ev(1, "C"), ev(2, "B"), ev(3, "A"), ev(4, "B"))
    // trends: (a3, b4); plus B-self-loop continuation (a3, b4) only — b2 has
    // no valid A predecessor, but (a3,b4) exists; (a3, b2)? b2 arrives
    // before a3 — no.
    assert(Engines.greta(Seq(q), events)(q.id).c == 1.0)
    Engines.assertSame(Engines.greta(Seq(q), events), Engines.brute(Seq(q), events))
  }

  test("mid negation across the Kleene suffix (SEQ(R, T+, NOT P, D))") {
    val q = TrendQuery("q", Pattern.seq("R", "T+", "!P", "D"), window = QueryWindow(4, 2))
    // r t p t d: T's before P cannot connect to D... but T after P can.
    val events = Seq(ev(0, "R"), ev(1, "T"), ev(2, "P"), ev(3, "T"), ev(4, "D"))
    // trends ending at d: last T must be after P: (r,t3,d), (r,t1,t3,d)
    assert(Engines.greta(Seq(q), events)(q.id).c == 2.0)
    Engines.assertSame(Engines.greta(Seq(q), events), Engines.brute(Seq(q), events))
  }

  for (seed <- 20 until 30) {
    test(s"negation equivalence through all policies on random streams (seed $seed)") {
      val rnd = new Random(4000 + seed)
      val events = TestGen.stream(rnd, 16, types = Vector("A", "B", "C", "D", "P"))
      val qs = Seq(
        TrendQuery("q1", Pattern.seq("A", "B+", "!P"), window = QueryWindow(4, 2)),
        TrendQuery("q2", Pattern.seq("C", "B+"), window = QueryWindow(4, 2)),
        TrendQuery("q3", Pattern.seq("A", "!C", "B+"), window = QueryWindow(4, 2)))
      val expected = Engines.brute(qs, events)
      policies.foreach(p => Engines.assertSame(Engines.hamlet(qs, events, p), expected, s"$seed/$p"))
    }
  }

  test("disjunctive aggregate by composition over shared sub-plans") {
    // COUNT(SEQ(A,B+) ∨ SEQ(C,B+)) via COUNT(P1), COUNT(P2), COUNT(P12)
    // where P12 = trends matched by both = SEQ over events matched by both
    // patterns: here none (different start types), so the union is the sum.
    val q1 = TrendQuery("q1", Pattern.seq("A", "B+"), window = QueryWindow(4, 2))
    val q2 = TrendQuery("q2", Pattern.seq("C", "B+"), window = QueryWindow(4, 2))
    val events = Seq(ev(0, "A"), ev(1, "C"), ev(2, "B"), ev(3, "B"))
    val aggs = Engines.hamlet(Seq(q1, q2), events, AlwaysShare)
    val c12 = 0.0
    assert(Composition.disjunctionCount(aggs("q1").c, aggs("q2").c, c12) == 6.0)
    assert(Composition.conjunctionCount(aggs("q1").c, aggs("q2").c, c12) == 9.0)
  }
}
