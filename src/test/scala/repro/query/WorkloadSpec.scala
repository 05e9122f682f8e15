package repro.query

import org.scalatest.funsuite.AnyFunSuite

class WorkloadSpec extends AnyFunSuite {

  private def q(id: String, p: Pattern, agg: Agg = Agg.CountStar,
                w: QueryWindow = QueryWindow(4, 2), grp: String = "grp") =
    TrendQuery(id, p, agg, Nil, w, grp)

  test("pane length is the gcd of all windows and slides (§3.1 example)") {
    assert(Workload.paneMinutes(Seq(
      q("a", Pattern.seq("B+"), w = QueryWindow(10, 5)),
      q("b", Pattern.seq("B+"), w = QueryWindow(15, 5)))) == 5)
  }

  test("pane gcd over a diverse workload") {
    assert(Workload.paneMinutes(Seq(
      q("a", Pattern.seq("B+"), w = QueryWindow(4, 2)),
      q("b", Pattern.seq("B+"), w = QueryWindow(12, 4)),
      q("c", Pattern.seq("B+"), w = QueryWindow(20, 4)))) == 2)
  }

  test("window/slide expressed in panes") {
    val wl = Workload.compile(Seq(
      q("a", Pattern.seq("B+"), w = QueryWindow(10, 5)),
      q("b", Pattern.seq("B+"), w = QueryWindow(15, 5))))
    assert(wl.paneMs == 5 * 60_000L)
    assert(wl.byId("a").windowPanes == 2 && wl.byId("a").slidePanes == 1)
    assert(wl.byId("b").windowPanes == 3)
  }

  test("Definition 4: Kleene sub-pattern shared by >1 query forms a set") {
    val wl = Workload.compile(Seq(
      q("q1", Pattern.seq("A", "B+")),
      q("q2", Pattern.seq("C", "B+")),
      q("q3", Pattern.seq("A", "D"))))
    assert(wl.sets.map(_.sharedType) == Vector("B"))
    assert(wl.sets.head.queries.map(_.id).toSet == Set("q1", "q2"))
    assert(wl.singletons.map(_.id) == Vector("q3"))
  }

  test("Definition 5: COUNT(*) does not share with SUM-family") {
    val wl = Workload.compile(Seq(
      q("q1", Pattern.seq("A", "B+"), Agg.CountStar),
      q("q2", Pattern.seq("C", "B+"), Agg.CountStar),
      q("q3", Pattern.seq("A", "B+"), Agg.Sum("B", "v")),
      q("q4", Pattern.seq("C", "B+"), Agg.Avg("B", "v")),
      q("q5", Pattern.seq("C", "B+"), Agg.CountE("B"))))
    assert(wl.sets.size == 2)
    val byClass = wl.sets.map(s => s.queries.map(_.id).toSet)
    assert(byClass.contains(Set("q1", "q2")))
    assert(byClass.contains(Set("q3", "q4", "q5"))) // AVG shares with SUM and COUNT(E)
  }

  test("MIN/MAX queries are never shared (documented narrowing of Def. 5)") {
    val wl = Workload.compile(Seq(
      q("q1", Pattern.seq("A", "B+"), Agg.Min("B", "v")),
      q("q2", Pattern.seq("C", "B+"), Agg.Min("B", "v"))))
    assert(wl.sets.isEmpty)
    assert(wl.singletons.size == 2)
  }

  test("different grouping attributes prevent sharing (Definition 5)") {
    val wl = Workload.compile(Seq(
      q("q1", Pattern.seq("A", "B+"), grp = "district"),
      q("q2", Pattern.seq("C", "B+"), grp = "driver")))
    assert(wl.sets.isEmpty)
  }

  test("queries without Kleene are singletons") {
    val wl = Workload.compile(Seq(
      q("q1", Pattern.seq("A", "B")),
      q("q2", Pattern.seq("A", "B+"))))
    assert(wl.singletons.map(_.id).toSet == Set("q1", "q2"))
  }

  test("channel union of a sum-family set") {
    val wl = Workload.compile(Seq(
      q("q3", Pattern.seq("A", "B+"), Agg.Sum("B", "v")),
      q("q4", Pattern.seq("C", "B+"), Agg.Avg("B", "w")),
      q("q5", Pattern.seq("C", "B+"), Agg.CountE("B"))))
    assert(wl.sets.head.channels == Vector("C", "N", "S:v", "S:w"))
  }

  test("duplicate query ids are rejected") {
    intercept[IllegalArgumentException](Workload.compile(Seq(
      q("q1", Pattern.seq("B+")), q("q1", Pattern.seq("B+")))))
  }

  test("type universe of a set includes negated types") {
    val wl = Workload.compile(Seq(
      q("q1", PSeq(List(PEvent("A"), PKleene(PEvent("B")), PNot("P")))),
      q("q2", Pattern.seq("C", "B+"))))
    assert(wl.sets.head.typeUniverse == Set("A", "B", "C", "P"))
  }

  test("channelsOf covers every aggregate") {
    assert(Workload.channelsOf(Agg.CountStar) == Seq("C"))
    assert(Workload.channelsOf(Agg.CountE("B")) == Seq("C", "N"))
    assert(Workload.channelsOf(Agg.Sum("B", "v")) == Seq("C", "S:v"))
    assert(Workload.channelsOf(Agg.Avg("B", "v")) == Seq("C", "N", "S:v"))
    assert(Workload.channelsOf(Agg.Min("B", "v")) == Seq("C"))
  }
}
