package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random
import TestGen._

class ApproxPrefsSpec extends AnyFunSuite {

  private val fig3aUsers = Seq(fig3aU1, fig3aU2, fig3aU3)

  test("Table V: tuple frequencies of the Fig. 3a preferences") {
    val n = 3.0
    val freq = fig3aUsers.flatMap(_.tuples).groupBy(identity)
      .view.mapValues(_.size / n).toMap
    assert(freq((A, T)) == 3 / 3.0)
    assert(freq((A, S)) == 2 / 3.0)
    assert(freq((L, T)) == 2 / 3.0)
    assert(freq((T, S)) == 2 / 3.0)
    assert(freq((S, L)) == 2 / 3.0)
    assert(freq((A, L)) == 1 / 3.0)
    assert(freq((L, S)) == 1 / 3.0)
    assert(freq((T, L)) == 1 / 3.0)
    assert(freq((S, T)) == 1 / 3.0)
    assert(!freq.contains((L, A)) && !freq.contains((T, A)) && !freq.contains((S, A)))
  }

  test("Example 11: replaying Table V's exact order yields the paper's relation") {
    // Table V order: (A,T) (A,S) (L,T) (T,S) (S,L) (A,L) (L,S) (T,L) (S,T).
    val order = Seq((A, T), (A, S), (L, T), (T, S), (S, L), (A, L), (L, S), (T, L), (S, T))
      .zipWithIndex.toMap
    val rel = ApproxPrefs.getApproxPreferenceTuples(fig3aUsers, threshold1 = 7,
      threshold2 = 0.6, tieRank = p => order(p).toLong)
    // Paper outcome: commons + (A,S), (L,T), (T,S), transitive (L,S);
    // (S,L) rejected (reverse present), then (A,L) stops the scan (freq 1/3 ≤ 60%).
    assert(rel.tuples.toSet == Set((A, T), (A, S), (L, T), (T, S), (L, S)))
  }

  test("Example 11 with default tie-break still satisfies all invariants") {
    val rel = ApproxPrefs.getApproxPreferenceTuples(fig3aUsers, threshold1 = 7, threshold2 = 0.6)
    assert(PrefRelation.isStrictPartialOrder(4, rel.tuples))
    assert(rel.prefers(A, T)) // the common tuple is always present
  }

  test("threshold2 excludes low-frequency tuples entirely") {
    val rel = ApproxPrefs.getApproxPreferenceTuples(fig3aUsers, threshold1 = 20, threshold2 = 0.99)
    assert(rel.tuples.toSet == Set((A, T))) // only the common tuple survives
  }

  test("threshold1 caps the relation size") {
    val rel = ApproxPrefs.getApproxPreferenceTuples(fig3aUsers, threshold1 = 2, threshold2 = 0.1)
    // Commons enter first; the cap halts approximate additions at size ≥ 2.
    assert(rel.size <= 3) // one addition may land exactly on the cap boundary
    assert(rel.prefers(A, T))
  }

  for (seed <- 0 until 10)
    test(s"Lemma 2(1): approx relation is a superset of the common relation (seed=$seed)") {
      val rng = new Random(seed)
      val m = 5 + rng.nextInt(5)
      val base = randomRelation(rng, m, 0.4)
      val rels = (0 until 4).map(_ => perturbedRelation(rng, base))
      val approx = ApproxPrefs.getApproxPreferenceTuples(rels, threshold1 = 30, threshold2 = 0.5)
      val common = PrefRelation.commonOf(rels)
      common.tuples.foreach { case (x, y) =>
        assert(approx.prefers(x, y), s"common tuple ($x,$y) missing from approx")
      }
      assert(PrefRelation.isStrictPartialOrder(m, approx.tuples))
    }

  for (seed <- 0 until 10)
    test(s"every approx tuple has frequency above threshold2 or is implied transitively (seed=$seed)") {
      val rng = new Random(100 + seed)
      val m = 5
      val rels = (0 until 3).map(_ => randomRelation(rng, m, 0.5))
      val t2 = 0.5
      val approx = ApproxPrefs.getApproxPreferenceTuples(rels, threshold1 = 30, threshold2 = t2)
      val freq = rels.flatMap(_.tuples).groupBy(identity).view.mapValues(_.size / 3.0).toMap
      // Tuples not above threshold can only appear via transitive closure of
      // accepted ones; verify the relation is reconstructible from its
      // above-threshold members.
      val aboveT = approx.tuples.filter(t => freq.getOrElse(t, 0.0) > t2)
      val reclosed = PrefRelation.fromEdges(m, aboveT)
      approx.tuples.foreach { case (x, y) => assert(reclosed.prefers(x, y)) }
    }

  for (seed <- 0 until 8)
    test(s"Theorem 3 via Lemma 2: P_aU ⊆ P_U on random object sets (seed=$seed)") {
      val rng = new Random(200 + seed)
      val domains = Seq(5, 6)
      val users = randomUsers(rng, 5, domains, nGroups = 1)
      val objects = randomObjects(rng, 50, domains)
      val common = Clustering.commonRels(users)
      val approx = ApproxPrefs.approxRels(users, threshold1 = 20, threshold2 = 0.5)
      assert(BruteForce.frontier(approx, objects).subsetOf(BruteForce.frontier(common, objects)))
    }

  test("single-user cluster: approx relation equals the user's own relation") {
    val rel = ApproxPrefs.getApproxPreferenceTuples(Seq(tableIvC1), threshold1 = 100, threshold2 = 0.5)
    assert(rel == tableIvC1)
  }
}

class MetricsSpec extends AnyFunSuite {
  import Metrics._

  test("perfect agreement gives precision = recall = F = 1") {
    val m = Map(1 -> Set(1L, 2L), 2 -> Set(3L))
    val p = prf(m, m)
    assert(p.precision == 1.0 && p.recall == 1.0 && p.fMeasure == 1.0)
  }

  test("false negatives reduce recall but not precision (the paper's Table XI shape)") {
    val exact = Map(1 -> Set(1L, 2L, 3L))
    val approx = Map(1 -> Set(1L, 2L))
    val p = prf(approx, exact)
    assert(p.precision == 1.0)
    assert(p.recall === 2.0 / 3)
  }

  test("false positives reduce precision") {
    val exact = Map(1 -> Set(1L))
    val approx = Map(1 -> Set(1L, 9L))
    val p = prf(approx, exact)
    assert(p.precision == 0.5 && p.recall == 1.0)
  }

  test("F-measure is the harmonic mean") {
    val p = PRF(1.0, 0.5)
    assert(math.abs(p.fMeasure - 2 * 1.0 * 0.5 / 1.5) < 1e-12)
  }

  test("summation is over users, not averaged per user (Eq. 7-8)") {
    val exact = Map(1 -> Set(1L), 2 -> Set(1L, 2L, 3L))
    val approx = Map(1 -> Set(1L), 2 -> Set(1L))
    val p = prf(approx, exact)
    assert(p.recall === 2.0 / 4) // (1 + 1) / (1 + 3)
  }

  test("empty approx and exact sets count as perfect") {
    val p = prf(Map(1 -> Set.empty[Long]), Map(1 -> Set.empty[Long]))
    assert(p.precision == 1.0 && p.recall == 1.0)
  }

  test("snapshot accumulation sums across snapshots") {
    val e1 = Map(1 -> Set(1L, 2L)); val a1 = Map(1 -> Set(1L))
    val e2 = Map(1 -> Set(3L)); val a2 = Map(1 -> Set(3L))
    val p = prfOverSnapshots(Seq(a1, a2), Seq(e1, e2))
    assert(p.precision == 1.0 && p.recall === 2.0 / 3)
  }
}
