package repro.general

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

/** §5 disjunction/conjunction count composition, checked against direct
  * set-based counting.
  */
class CompositionSpec extends AnyFunSuite {

  test("disjunction: COUNT(P1 ∨ P2) = C1 + C2 + C12") {
    // count1=5 includes 2 shared; count2=4 includes 2 shared.
    assert(Composition.disjunctionCount(5, 4, 2) == 3 + 2 + 2)
  }

  test("disjunction with no overlap is the plain sum") {
    assert(Composition.disjunctionCount(5, 4, 0) == 9)
  }

  test("disjunction where P1 subsumes P2") {
    assert(Composition.disjunctionCount(5, 2, 2) == 5)
  }

  test("conjunction: pairs across exclusive and shared matches") {
    // C1=3, C2=2, C12=2: 3·2 + 3·2 + 2·2 + C(2,2)=1 -> 17
    assert(Composition.conjunctionCount(5, 4, 2) == 3 * 2 + 3 * 2 + 2 * 2 + 1)
  }

  test("conjunction with no shared trends is the cross product") {
    assert(Composition.conjunctionCount(3, 4, 0) == 12)
  }

  test("conjunction with everything shared is C12 choose 2") {
    assert(Composition.conjunctionCount(4, 4, 4) == 6)
  }

  test("property: composition equals direct counting over random trend sets") {
    val rnd = new Random(7)
    (1 to 300).foreach { _ =>
      // Universe of trends 0..n; P1 matches m1, P2 matches m2 (with overlap).
      val n = 1 + rnd.nextInt(20)
      val m1 = (0 to n).filter(_ => rnd.nextBoolean()).toSet
      val m2 = (0 to n).filter(_ => rnd.nextBoolean()).toSet
      val c1 = m1.size.toDouble; val c2 = m2.size.toDouble
      val c12 = (m1 intersect m2).size.toDouble
      assert(Composition.disjunctionCount(c1, c2, c12) == (m1 union m2).size.toDouble)
      // Conjunction counts unordered pairs {a, b}, a != b, where one trend
      // matches P1 and the other P2.
      val univ = (m1 union m2).toSeq.sorted
      val direct = (for {
        a <- univ; b <- univ if a < b
        if (m1(a) && m2(b)) || (m1(b) && m2(a))
      } yield 1).size
      val viaPairs = {
        val x1 = (m1 diff m2).size; val x2 = (m2 diff m1).size; val s = c12.toInt
        x1 * x2 + x1 * s + x2 * s + s * (s - 1) / 2
      }
      assert(Composition.conjunctionCount(c1, c2, c12) == viaPairs.toDouble)
      assert(viaPairs == direct)
    }
  }
}
