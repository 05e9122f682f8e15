package repro.events

import org.scalatest.funsuite.AnyFunSuite

class StreamGenSpec extends AnyFunSuite {

  test("ridesharing: deterministic in (params, seed)") {
    val a = StreamGen.ridesharing(2, 1000, 50, seed = 5)
    val b = StreamGen.ridesharing(2, 1000, 50, seed = 5)
    assert(a == b)
  }

  test("ridesharing: different seeds differ") {
    assert(StreamGen.ridesharing(1, 500, 20, seed = 1) != StreamGen.ridesharing(1, 500, 20, seed = 2))
  }

  test("ridesharing: sorted by time with dense monotone ids") {
    val evs = StreamGen.ridesharing(2, 1000, 50)
    assert(evs.map(_.id) == evs.indices.map(_.toLong))
    assert(evs.sliding(2).forall { case Seq(a, b) => a.ts <= b.ts; case _ => true })
  }

  test("ridesharing: hits the target event budget and horizon") {
    val evs = StreamGen.ridesharing(3, 2000, 50)
    assert(evs.size >= 6000 && evs.size < 6000 * 1.3)
    assert(evs.forall(e => e.ts >= 0 && e.ts < 3 * 60_000L))
  }

  test("ridesharing: trip structure R then T-burst per group") {
    val evs = StreamGen.ridesharing(2, 1000, 30, seed = 8)
    val types = evs.map(_.typ).toSet
    assert(Set("R", "T").subsetOf(types))
    assert(evs.count(_.typ == "T") > evs.count(_.typ == "R")) // Kleene bursts dominate
  }

  test("ridesharing: speed attribute spans slow and fast regimes") {
    val speeds = StreamGen.ridesharing(2, 2000, 50).filter(_.typ == "T").map(_.num("speed"))
    assert(speeds.exists(_ < 10) && speeds.exists(_ > 10))
  }

  test("stockLike: calm and scattered volume regimes alternate") {
    val evs = StreamGen.stockLike(8, 2000, 20, regimeMinutes = 2)
    val p = evs.filter(_.typ == "P")
    val calm = p.filter(e => (e.ts / 120_000L) % 2 == 0).map(_.num("volume"))
    val scat = p.filter(e => (e.ts / 120_000L) % 2 == 1).map(_.num("volume"))
    assert(calm.nonEmpty && scat.nonEmpty)
    assert(calm.forall(_ > 55.0))      // calm regime passes all thresholds
    assert(scat.exists(_ < 50.0))      // scattered regime straddles them
  }

  test("stockLike: session structure O P+ S per company") {
    val evs = StreamGen.stockLike(2, 1000, 10)
    assert(evs.map(_.typ).toSet == Set("O", "P", "S"))
    assert(evs.forall(_.grp.startsWith("c")))
  }

  test("taxiLike: few district groups") {
    val evs = StreamGen.taxiLike(2, 400, nDistricts = 5)
    assert(evs.map(_.grp).distinct.size <= 5)
    assert(evs.map(_.typ).toSet == Set("R", "T", "D"))
  }

  test("smartHomeLike: plug groups and voltage attribute") {
    val evs = StreamGen.smartHomeLike(1, 2000, nPlugs = 30)
    assert(evs.map(_.typ).toSet == Set("L", "M", "H"))
    assert(evs.filter(_.typ == "M").forall(_.num.contains("voltage")))
  }

  test("pane assignment is consistent with timestamps") {
    val evs = StreamGen.ridesharing(4, 500, 20)
    assert(evs.forall(e => e.pane(60_000L) == e.ts / 60_000L))
  }
}
