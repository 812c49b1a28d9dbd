package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import TestGen._

class FrontierSpec extends AnyFunSuite {

  private def mkFrontier(prefs: Array[PrefRelation]) = new Frontier(prefs, new OpCounter)

  test("first object is always Pareto-optimal") {
    val f = mkFrontier(Array(cpuC1))
    assert(f.update(Obj(1, Array(Single))).isPareto)
    assert(f.ids == Set(1L))
  }

  test("dominated arrival is rejected and frontier unchanged") {
    val f = mkFrontier(Array(cpuC1))
    f.update(Obj(1, Array(Dual)))
    val r = f.update(Obj(2, Array(Single)))
    assert(!r.isPareto && r.removed.isEmpty)
    assert(f.ids == Set(1L))
  }

  test("dominating arrival evicts dominated members") {
    val f = mkFrontier(Array(cpuC1))
    f.update(Obj(1, Array(Single)))
    val r = f.update(Obj(2, Array(Dual)))
    assert(r.isPareto && r.removed.map(_.ts) == Seq(1L))
    assert(f.ids == Set(2L))
  }

  test("identical arrival is Pareto and both objects stay (Def. 2)") {
    val f = mkFrontier(Array(cpuC1))
    f.update(Obj(1, Array(Dual)))
    val r = f.update(Obj(2, Array(Dual)))
    assert(r.isPareto && r.removed.isEmpty)
    assert(f.ids == Set(1L, 2L))
  }

  test("incomparable objects coexist on the frontier") {
    val f = mkFrontier(Array(cpuC1))
    f.update(Obj(1, Array(Triple)))
    val r = f.update(Obj(2, Array(Quad))) // triple and quad incomparable for c1
    assert(r.isPareto)
    assert(f.ids == Set(1L, 2L))
  }

  for (seed <- 0 until 15)
    test(s"incremental frontier equals from-scratch frontier (seed=$seed)") {
      val rng = new Random(seed)
      val domains = Seq(4 + rng.nextInt(4), 4 + rng.nextInt(4))
      val prefs = domains.map(m => randomRelation(rng, m, 0.4)).toArray
      val objs = randomObjects(rng, 60, domains)
      val f = mkFrontier(prefs)
      objs.foreach(f.update)
      assert(f.ids == BruteForce.frontier(prefs, objs),
        s"prefs=${prefs.mkString(";")} objs=$objs")
    }

  for (seed <- 0 until 5)
    test(s"isPareto flag matches membership in the final frontier of the prefix (seed=$seed)") {
      val rng = new Random(100 + seed)
      val domains = Seq(5, 5)
      val prefs = domains.map(m => randomRelation(rng, m, 0.4)).toArray
      val objs = randomObjects(rng, 40, domains)
      val f = mkFrontier(prefs)
      objs.zipWithIndex.foreach { case (o, i) =>
        val r = f.update(o)
        assert(r.isPareto == BruteForce.frontier(prefs, objs.take(i + 1)).contains(o.ts))
      }
    }

  test("dominatesNew does not mutate the frontier") {
    val f = mkFrontier(Array(cpuC1))
    f.update(Obj(1, Array(Dual)))
    assert(f.dominatesNew(Obj(2, Array(Single))))
    assert(!f.dominatesNew(Obj(3, Array(Dual)))) // identical is not dominated
    assert(f.ids == Set(1L))
  }

  test("evictDominatedBy removes exactly the dominated members") {
    val f = mkFrontier(Array(cpuC1))
    f.update(Obj(1, Array(Triple)))
    f.update(Obj(2, Array(Quad)))
    val gone = f.evictDominatedBy(Obj(3, Array(Dual))) // dual dominates both
    assert(gone.map(_.ts).toSet == Set(1L, 2L))
    assert(f.ids.isEmpty)
  }
}
