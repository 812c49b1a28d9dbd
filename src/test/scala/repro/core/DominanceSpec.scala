package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import TestGen._

class DominanceSpec extends AnyFunSuite {
  private def prefs2 = Array(cpuC1, tableIvU1) // d=2: CPU + brand

  private val c = new OpCounter

  test("identical objects compare as Identical") {
    assert(Dominance.compare(prefs2, Array(Dual, A), Array(Dual, A), c) == Dominance.Identical)
  }

  test("better on one attribute, equal on the other: dominates") {
    // CPU dual ≻ single (c1), same brand.
    assert(Dominance.compare(prefs2, Array(Dual, A), Array(Single, A), c) == Dominance.Dominates)
    assert(Dominance.compare(prefs2, Array(Single, A), Array(Dual, A), c) == Dominance.DominatedBy)
  }

  test("better on all attributes: dominates") {
    // dual ≻ single; Apple ≻ Samsung in U1.
    assert(Dominance.compare(prefs2, Array(Dual, A), Array(Single, S), c) == Dominance.Dominates)
  }

  test("trade-off: incomparable") {
    // dual ≻ single but Samsung ⊀ Apple... A ≻ S, so give each one win:
    // o1 better on CPU, o2 better on brand.
    assert(Dominance.compare(prefs2, Array(Dual, S), Array(Single, A), c) == Dominance.Incomparable)
  }

  test("incomparable attribute values block dominance") {
    // Toshiba and Apple are incomparable in U1.
    assert(Dominance.compare(prefs2, Array(Dual, T), Array(Single, A), c) == Dominance.Incomparable)
  }

  test("counter counts every comparison") {
    val k = new OpCounter
    Dominance.compare(prefs2, Array(Dual, A), Array(Single, A), k)
    Dominance.compare(prefs2, Array(Dual, A), Array(Single, A), k)
    assert(k.comparisons == 2)
  }

  for (seed <- 0 until 10)
    test(s"dominance is transitive and asymmetric (seed=$seed)") {
      val rng = new Random(seed)
      val domains = Seq(5, 6, 4)
      val prefs = domains.map(m => randomRelation(rng, m)).toArray
      val objs = randomObjects(rng, 12, domains)
      val k = new OpCounter
      for (a <- objs; b <- objs) {
        val ab = Dominance.compare(prefs, a.attrs, b.attrs, k)
        val ba = Dominance.compare(prefs, b.attrs, a.attrs, k)
        // Compare is symmetric-consistent.
        assert(ab == -ba || (ab == Dominance.Identical && ba == Dominance.Identical)
          || (ab == Dominance.Incomparable && ba == Dominance.Incomparable))
        if (ab == Dominance.Dominates)
          for (cc <- objs if Dominance.compare(prefs, b.attrs, cc.attrs, k) == Dominance.Dominates)
            assert(Dominance.compare(prefs, a.attrs, cc.attrs, k) == Dominance.Dominates)
      }
    }
}
