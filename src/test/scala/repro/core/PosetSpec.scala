package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import TestGen._

class PosetSpec extends AnyFunSuite {

  test("fromEdges computes the transitive closure") {
    val r = PrefRelation.fromEdges(4, Seq((0, 1), (1, 2), (2, 3)))
    assert(r.prefers(0, 3) && r.prefers(0, 2) && r.prefers(1, 3))
    assert(r.size == 6)
  }

  test("fromEdges rejects reflexive tuples") {
    assertThrows[IllegalArgumentException](PrefRelation.fromEdges(3, Seq((1, 1))))
  }

  test("fromEdges rejects cycles") {
    assertThrows[IllegalArgumentException](PrefRelation.fromEdges(3, Seq((0, 1), (1, 2), (2, 0))))
  }

  test("fromEdges rejects direct asymmetry violations") {
    assertThrows[IllegalArgumentException](PrefRelation.fromEdges(3, Seq((0, 1), (1, 0))))
  }

  test("empty relation has no tuples and all values maximal") {
    val r = PrefRelation.empty(5)
    assert(r.size == 0)
    assert(r.maximalValues == scala.collection.immutable.BitSet(0, 1, 2, 3, 4))
  }

  test("isStrictPartialOrder accepts valid and rejects cyclic edge sets") {
    assert(PrefRelation.isStrictPartialOrder(3, Seq((0, 1), (1, 2))))
    assert(!PrefRelation.isStrictPartialOrder(3, Seq((0, 1), (1, 2), (2, 0))))
  }

  test("Example 3: c1 CPU relation has exactly the paper's 5 tuples") {
    assert(cpuC1.tuples.toSet == Set((Dual, Single), (Dual, Quad), (Dual, Triple),
      (Triple, Single), (Quad, Single)))
  }

  test("Example 3: c2 CPU relation is the 6-tuple chain closure") {
    assert(cpuC2.tuples.toSet == Set((Dual, Single), (Triple, Single), (Quad, Single),
      (Triple, Dual), (Quad, Dual), (Quad, Triple)))
  }

  test("Example 3: common CPU preference relation of c1 and c2") {
    assert(cpuC1.intersect(cpuC2).tuples.toSet ==
      Set((Dual, Single), (Triple, Single), (Quad, Single)))
  }

  test("Table IV: U1 = c1 ∩ c2 matches Examples 6-9") {
    assert(tableIvU1.tuples.toSet == Set((A, L), (A, S), (L, S), (T, S)))
  }

  test("Table IV: U2 = c3 ∩ c4 matches Examples 6-9") {
    assert(tableIvU2.tuples.toSet == Set((S, L), (S, A), (S, T), (L, A), (L, T)))
  }

  test("Table IV: U3 = c5 ∩ c6 matches Examples 6-9") {
    assert(tableIvU3.tuples.toSet == Set((L, A), (L, T), (L, S), (A, S)))
  }

  test("Example 8: maximal values of U1, U2, U3") {
    assert(tableIvU1.maximalValues.toSet == Set(A, T))
    assert(tableIvU2.maximalValues.toSet == Set(S))
    assert(tableIvU3.maximalValues.toSet == Set(L))
  }

  test("Example 8: value weights in U1 are 1, 1/2, 1/2, 1") {
    assert(tableIvU1.weight(A) == 1.0)
    assert(tableIvU1.weight(L) == 0.5)
    assert(tableIvU1.weight(S) == 0.5)
    assert(tableIvU1.weight(T) == 1.0)
  }

  test("Example 8: value weights in U2 are 1/3, 1/2, 1, 1/3") {
    assert(tableIvU2.weight(A) === 1.0 / 3)
    assert(tableIvU2.weight(L) == 0.5)
    assert(tableIvU2.weight(S) == 1.0)
    assert(tableIvU2.weight(T) === 1.0 / 3)
  }

  test("Example 8: value weights in U3 are 1/2, 1, 1/3, 1/2") {
    assert(tableIvU3.weight(A) == 0.5)
    assert(tableIvU3.weight(L) == 1.0)
    assert(tableIvU3.weight(S) === 1.0 / 3)
    assert(tableIvU3.weight(T) == 0.5)
  }

  test("hasse successors drop transitively implied edges") {
    val chain = PrefRelation.fromEdges(4, Seq((0, 1), (1, 2), (2, 3)))
    assert(chain.hasseSuccessors(0).toSet == Set(1))
    assert(chain.hasseSuccessors(1).toSet == Set(2))
    assert(chain.hasseSuccessors(2).toSet == Set(3))
  }

  test("add() inserts a tuple and closes transitively") {
    val r = PrefRelation.fromEdges(4, Seq((0, 1), (2, 3)))
    val r2 = r.add(1, 2)
    assert(r2.prefers(0, 3) && r2.prefers(1, 3) && r2.prefers(0, 2))
    assert(r2.size == 6)
  }

  test("canAdd rejects reflexive and cycle-forming tuples") {
    val r = PrefRelation.fromEdges(3, Seq((0, 1), (1, 2)))
    assert(!r.canAdd(1, 1))
    assert(!r.canAdd(2, 0))
    assert(r.canAdd(2, 1) == false) // (1,2) present, reverse would cycle
    assert(r.canAdd(0, 2) == true)  // already implied, still a valid SPO
  }

  for (seed <- 0 until 10)
    test(s"closure is idempotent and transitive (seed=$seed)") {
      val rng = new Random(seed)
      val r = randomRelation(rng, 8 + rng.nextInt(8))
      val reclosed = PrefRelation.fromEdges(r.domainSize, r.tuples)
      assert(reclosed == r)
      for ((x, y) <- r.tuples; z <- r.worse(y)) assert(r.prefers(x, z))
      for ((x, y) <- r.tuples) assert(!r.prefers(y, x), s"asymmetry violated at ($x,$y)")
    }

  for (seed <- 0 until 10)
    test(s"intersection is a strict partial order contained in both (seed=$seed)") {
      val rng = new Random(1000 + seed)
      val m = 6 + rng.nextInt(6)
      val a = randomRelation(rng, m); val b = randomRelation(rng, m)
      val i = a.intersect(b)
      assert(PrefRelation.isStrictPartialOrder(m, i.tuples))
      i.tuples.foreach { case (x, y) => assert(a.prefers(x, y) && b.prefers(x, y)) }
      a.tuples.foreach { case (x, y) => if (b.prefers(x, y)) assert(i.prefers(x, y)) }
    }

  for (seed <- 0 until 5)
    test(s"weights: maximal values weigh 1, successors at most 1/2 (seed=$seed)") {
      val rng = new Random(2000 + seed)
      val r = randomRelation(rng, 10)
      r.maximalValues.foreach(v => assert(r.weight(v) == 1.0))
      for (x <- 0 until 10; y <- r.hasseSuccessors(x)) assert(r.weight(y) <= 0.5)
    }

  test("commonOf reduces over many relations") {
    val common = PrefRelation.commonOf(Seq(tableIvC1, tableIvC2, tableIvC5))
    // c5 has none of U1's tuples except (A,S)? c5={(L,A),(L,T),(A,S),(T,S),(L,S)}
    assert(common.tuples.toSet == Set((A, S), (L, S), (T, S)).intersect(tableIvC5.tuples.toSet)
      .intersect(tableIvU1.tuples.toSet))
  }
}
