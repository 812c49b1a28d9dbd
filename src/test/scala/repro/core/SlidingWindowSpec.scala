package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable
import scala.util.Random
import TestGen._

/** Sliding-window correctness (Sec. VII): both BaselineSW and
  * FilterThenVerifySW must track, at every step, the brute-force Pareto
  * frontier of the alive window (Def. 9), and their Pareto buffers must
  * match Def. 10.
  */
class SlidingWindowSpec extends AnyFunSuite {

  /** Step-by-step checker: replay the stream through BaselineSW user
    * states while checking frontier and buffer against brute force.
    */
  private def checkBaselineSW(users: Seq[UserPrefs], objects: Seq[Obj], w: Int): Unit = {
    val counter = new OpCounter
    val states = users.map(u => u -> new BaselineSW.UserState(u.rels, counter))
    val sorted = objects.sortBy(_.ts)
    sorted.zipWithIndex.foreach { case (o, i) =>
      if (i >= w) states.foreach(_._2.onExpiry(sorted(i - w).ts))
      states.foreach(_._2.onArrival(o))
      val alive = sorted.slice(math.max(0, i - w + 1), i + 1)
      states.foreach { case (u, st) =>
        assert(st.frontier.ids == BruteForce.frontier(u.rels, alive),
          s"user ${u.userId} step $i frontier mismatch")
        assert(st.buffer.keySet.toSet == BruteForce.buffer(u.rels, alive),
          s"user ${u.userId} step $i buffer mismatch")
      }
    }
  }

  for (seed <- 0 until 8)
    test(s"BaselineSW frontier and buffer match Defs. 9/10 at every step (seed=$seed)") {
      val rng = new Random(seed)
      val domains = Seq(4, 5)
      val users = randomUsers(rng, 4, domains)
      val objects = randomObjects(rng, 60, domains)
      checkBaselineSW(users, objects, w = 8 + rng.nextInt(12))
    }

  for (seed <- 0 until 8)
    test(s"FilterThenVerifySW tracks the brute-force windowed frontier (seed=$seed)") {
      val rng = new Random(100 + seed)
      val domains = Seq(4, 5)
      val users = randomUsers(rng, 8, domains)
      val objects = randomObjects(rng, 70, domains)
      val clusters = randomExactClusters(rng, users, 3)
      val w = 10 + rng.nextInt(10)
      val counters = clusters.map(_ => new OpCounter)
      val states = clusters.zip(counters).map { case (c, k) => new FilterThenVerifySW.ClusterState(c, k) }
      val sorted = objects.sortBy(_.ts)
      val byId = users.map(u => u.userId -> u).toMap
      sorted.zipWithIndex.foreach { case (o, i) =>
        if (i >= w) states.foreach(_.onExpiry(sorted(i - w).ts))
        states.foreach(_.onArrival(o))
        val alive = sorted.slice(math.max(0, i - w + 1), i + 1)
        states.foreach { st =>
          assert(st.filterFrontier.ids == BruteForce.frontier(st.cluster.filterRels, alive),
            s"cluster ${st.cluster.clusterId} step $i P_U mismatch")
          assert(st.buffer.keySet.toSet == BruteForce.buffer(st.cluster.filterRels, alive),
            s"cluster ${st.cluster.clusterId} step $i PB_U mismatch")
          st.frontiers.foreach { case (uid, ids) =>
            assert(ids == BruteForce.frontier(byId(uid).rels, alive),
              s"user $uid step $i P_c mismatch (alive=${alive.map(_.ts)})")
          }
        }
      }
    }

  for (seed <- 0 until 6)
    test(s"FilterThenVerifySW and BaselineSW emit identical target users (seed=$seed)") {
      val rng = new Random(200 + seed)
      val domains = Seq(5, 4)
      val users = randomUsers(rng, 6, domains)
      val objects = randomObjects(rng, 80, domains)
      val clusters = randomExactClusters(rng, users, 2)
      val w = 12 + rng.nextInt(8)
      val base = BaselineSW.run(users, objects, w)
      val ftv = FilterThenVerifySW.run(clusters, objects, w)
      assert(ftv.emissions.map(e => e.ts -> e.users).toMap == base.emissions.map(e => e.ts -> e.users).toMap)
      assert(ftv.frontiers == base.frontiers)
    }

  test("window larger than the stream behaves like the append-only algorithms") {
    val rng = new Random(7)
    val domains = Seq(5, 5)
    val users = randomUsers(rng, 5, domains)
    val objects = randomObjects(rng, 40, domains)
    val swRun = BaselineSW.run(users, objects, window = 1000)
    val plain = Baseline.run(users, objects)
    assert(swRun.frontiers == plain.frontiers)
    // Arrival-time emissions agree (no expiries ever happen).
    assert(swRun.emissions.map(e => e.ts -> e.users).toMap == plain.emissions.map(e => e.ts -> e.users).toMap)
  }

  test("Theorem 5: an object dominated by a later object never re-enters the frontier") {
    // cpuC1: dual ≻ quad; o1=quad arrives, o2=dual dominates it, then o2
    // expires — o1 must NOT come back (it left the buffer for good).
    val users = Seq(UserPrefs(0, Array(cpuC1)))
    val objects = Seq(Obj(1, Array(Quad)), Obj(2, Array(Dual)),
      Obj(3, Array(Single)), Obj(4, Array(Single)))
    val res = BaselineSW.run(users, objects, window = 2)
    // Window (2,4]: alive = {o3,o4}; o1 was dominated by o2 and is gone
    // even though o2 has expired.
    assert(res.frontiers(0) == Set(3L, 4L))
  }

  test("Example 16 shape: mend promotes buffered objects when their dominator expires") {
    // Single attribute, chain 0 ≻ 1 ≻ 2. Stream: v1, v0, v1, v2 with W=3.
    val chain = PrefRelation.fromEdges(3, Seq((0, 1), (1, 2)))
    val users = Seq(UserPrefs(0, Array(chain)))
    val objects = Seq(Obj(1, Array(1)), Obj(2, Array(0)), Obj(3, Array(1)), Obj(4, Array(2)))
    val res = BaselineSW.run(users, objects, window = 3)
    // After ts=4 arrives, ts=1 expired; alive {2,3,4}: frontier = {2} (value 0).
    assert(res.frontiers(0) == Set(2L))
    // One more arrival expires ts=2 (the dominator): ts=3 (value 1) must be mended in.
    val res2 = BaselineSW.run(users, objects :+ Obj(5, Array(2)), window = 3)
    assert(res2.frontiers(0) == Set(3L))
    // The promoted object is credited to C_o (late dissemination).
    assert(res2.emissions.map(e => e.ts -> e.users).toMap.apply(3L) == Set(0))
  }

  for (seed <- 0 until 6)
    test(s"Theorem 6: PB_U ⊇ P_U and PB_U ⊇ PB_c (seed=$seed)") {
      val rng = new Random(400 + seed)
      val domains = Seq(4, 4)
      val users = randomUsers(rng, 6, domains)
      val objects = randomObjects(rng, 50, domains).sortBy(_.ts)
      val clusters = randomExactClusters(rng, users, 2)
      val w = 15
      (w until objects.size).foreach { i =>
        val alive = objects.slice(i - w + 1, i + 1)
        clusters.foreach { cl =>
          val pbU = BruteForce.buffer(cl.filterRels, alive)
          assert(BruteForce.frontier(cl.filterRels, alive).subsetOf(pbU))
          cl.members.foreach { u =>
            assert(BruteForce.buffer(u.rels, alive).subsetOf(pbU))
          }
        }
      }
    }

  test("snapshots are captured at the requested cadence") {
    val rng = new Random(11)
    val domains = Seq(4)
    val users = randomUsers(rng, 2, domains)
    val objects = randomObjects(rng, 30, domains)
    val res = BaselineSW.run(users, objects, window = 10, snapshotEvery = 10)
    assert(res.snapshots.size == 3)
  }
}
