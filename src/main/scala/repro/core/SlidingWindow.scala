package repro.core

import scala.collection.mutable

/** Count-based sliding window of size `W` (Sec. VII): upon arrival of
  * `o_in` with timestamp `in`, the object with timestamp `in - W` expires;
  * the window holds timestamps `(in - W, in]`.
  *
  * Both algorithms maintain, per maintained entity, a *Pareto frontier
  * buffer* `PB` (Def. 10): alive objects not dominated by any following
  * alive object. Every arrival enters the buffer (it has no followers
  * yet); buffer members dominated by a later arrival are discarded forever
  * (Thm. 5). The Pareto frontier is always the set of `PB` members not
  * dominated by any other alive object.
  */
object SlidingWindowOps {

  /** `refreshParetoBufferSW`: admit `o_in`, evict buffer members it
    * dominates. `buf` is kept in arrival order.
    */
  def refreshBuffer(buf: mutable.LinkedHashMap[Long, Obj], prefs: Array[PrefRelation],
                    oIn: Obj, counter: OpCounter): Unit = {
    val gone = buf.values.filter(o =>
      Dominance.compare(prefs, oIn.attrs, o.attrs, counter) == Dominance.Dominates).toSeq
    gone.foreach(o => buf.remove(o.ts))
    buf.put(oIn.ts, oIn)
  }
}

/** Algorithm 4 (BaselineSW): per-user frontier `P_c` plus per-user Pareto
  * buffer `PB_c`.
  */
object BaselineSW {

  final class UserState(val prefs: Array[PrefRelation], val counter: OpCounter)
      extends Serializable {
    val frontier = new Frontier(prefs, counter)
    val buffer = mutable.LinkedHashMap.empty[Long, Obj]

    /** Expiry of `o_out` (if alive state holds it). Returns objects newly
      * promoted into `P_c` (late dissemination — they join `C_o` now).
      */
    def onExpiry(outTs: Long): Seq[Obj] = {
      val promoted = mutable.ArrayBuffer.empty[Obj]
      if (frontier.contains(outTs)) {
        val oOut = buffer(outTs)
        frontier.remove(outTs)
        buffer.remove(outTs)
        // mendParetoFrontierSW: buffer members dominated (exclusively,
        // checked against the remaining frontier) by o_out get promoted.
        buffer.values.foreach { o =>
          if (Dominance.compare(prefs, oOut.attrs, o.attrs, counter) == Dominance.Dominates
              && !frontier.dominatesNew(o)) {
            frontier.insert(o)
            promoted += o
          }
        }
      } else buffer.remove(outTs)
      promoted.toSeq
    }

    /** Arrival of `o_in`; true iff `o_in` is Pareto-optimal now. */
    def onArrival(oIn: Obj): Boolean = {
      val isPareto = !frontier.dominatesNew(oIn)
      if (isPareto) {
        // updateParetoFrontierSW: o_in joins P_c, evicts dominated members.
        frontier.evictDominatedBy(oIn)
        frontier.insert(oIn)
      }
      SlidingWindowOps.refreshBuffer(buffer, prefs, oIn, counter)
      isPareto
    }
  }

  /** Replay the stream with window size `W`. Emissions report `C_{o_in}`
    * at arrival time; late promotions (mend on expiry) are *also* credited
    * to the promoted object's emission set, mirroring `C_o ← C_o ∪ {c}` in
    * Procedure mendParetoFrontierSW.
    */
  def run(users: Seq[UserPrefs], objects: Seq[Obj], window: Int,
          snapshotEvery: Int = Int.MaxValue): SWRunResult = {
    val t0 = System.nanoTime()
    val counter = new OpCounter
    val states = users.map(u => u.userId -> new UserState(u.rels, counter)).toMap
    val sorted = objects.sortBy(_.ts)
    val emissions = mutable.LinkedHashMap.empty[Long, Set[Int]]
    val snapshots = mutable.ArrayBuffer.empty[Map[Int, Set[Long]]]
    sorted.zipWithIndex.foreach { case (o, i) =>
      if (i >= window) {
        val outTs = sorted(i - window).ts
        states.foreach { case (uid, st) =>
          st.onExpiry(outTs).foreach(p =>
            emissions.updateWith(p.ts)(prev => Some(prev.getOrElse(Set.empty) + uid)))
        }
      }
      val targets = states.iterator.collect { case (uid, st) if st.onArrival(o) => uid }.toSet
      emissions.updateWith(o.ts)(prev => Some(prev.getOrElse(Set.empty) ++ targets))
      if ((i + 1) % snapshotEvery == 0)
        snapshots += states.map { case (u, st) => u -> st.frontier.ids }
    }
    SWRunResult(emissions.toSeq.map { case (ts, us) => Emission(ts, us) },
      states.map { case (u, st) => u -> st.frontier.ids },
      snapshots.toSeq, counter.comparisons, System.nanoTime() - t0)
  }
}

/** Result of a sliding-window run; `snapshots` are periodic per-user
  * frontier captures used for efficacy accounting (Table XII).
  */
final case class SWRunResult(emissions: Seq[Emission],
                             frontiers: Map[Int, Set[Long]],
                             snapshots: Seq[Map[Int, Set[Long]]],
                             comparisons: Long,
                             wallNanos: Long) extends Serializable

/** Algorithm 5 (FilterThenVerifySW): one filter frontier `P_U` and ONE
  * Pareto buffer `PB_U` per cluster (vs one buffer per user in BaselineSW
  * — Thm. 6 makes the shared buffer sufficient), plus member frontiers.
  *
  * Mend-on-expiry correction (see DESIGN.md): the paper's pseudocode only
  * re-checks member frontiers for objects newly promoted into `P_U`, which
  * misses objects already in `P_U` that `o_out`'s expiry frees at the user
  * level. We mend member frontiers from the candidate set
  * `{o ∈ P_U : o_out ≻_c o}` — provably the complete candidate set, since
  * any object entering `P_c` must be in `P_U` (Lemma 1 over the window)
  * and must have had `o_out` among its dominators.
  */
object FilterThenVerifySW {

  final class ClusterState(val cluster: Cluster, val counter: OpCounter)
      extends Serializable {
    val filterFrontier = new Frontier(cluster.filterRels, counter)
    val buffer = mutable.LinkedHashMap.empty[Long, Obj]
    val userFrontiers: Map[Int, Frontier] =
      cluster.members.map(u => u.userId -> new Frontier(u.rels, counter)).toMap
    private val memberPrefs: Map[Int, Array[PrefRelation]] =
      cluster.members.map(u => u.userId -> u.rels).toMap

    /** Expiry; returns (userId -> promoted objects) for late dissemination. */
    def onExpiry(outTs: Long): Map[Int, Seq[Obj]] = {
      if (!filterFrontier.contains(outTs)) { buffer.remove(outTs); return Map.empty }
      val oOut = buffer(outTs)
      filterFrontier.remove(outTs)
      buffer.remove(outTs)
      // mendParetoFrontierUSW: promote buffer members dominated by o_out
      // w.r.t. ≻_U and not dominated by the remaining P_U.
      buffer.values.foreach { o =>
        if (Dominance.compare(cluster.filterRels, oOut.attrs, o.attrs, counter) == Dominance.Dominates
            && !filterFrontier.dominatesNew(o))
          filterFrontier.insert(o)
      }
      // Per-member mend: only members that held o_out can gain objects.
      val promotions = mutable.Map.empty[Int, Seq[Obj]]
      userFrontiers.foreach { case (uid, pc) =>
        if (pc.contains(outTs)) {
          pc.remove(outTs)
          val prefs = memberPrefs(uid)
          // Candidates from P_U can c-dominate each other (they are only
          // mutually non-dominated w.r.t. ≻_U), so check each against the
          // remaining frontier AND the other candidates before promoting.
          val cand = filterFrontier.objects.filter { o =>
            !pc.contains(o.ts) &&
            Dominance.compare(prefs, oOut.attrs, o.attrs, counter) == Dominance.Dominates
          }
          val promoted = cand.filter { o =>
            !pc.dominatesNew(o) &&
            !cand.exists(p => p.ts != o.ts &&
              Dominance.compare(prefs, p.attrs, o.attrs, counter) == Dominance.Dominates)
          }
          promoted.foreach(pc.insert)
          if (promoted.nonEmpty) promotions(uid) = promoted
        }
      }
      promotions.toMap
    }

    /** Arrival; returns the member users for whom `o_in` is Pareto-optimal. */
    def onArrival(oIn: Obj): Set[Int] = {
      val targets = mutable.Set.empty[Int]
      if (!filterFrontier.dominatesNew(oIn)) {
        // updateParetoFrontierUSW: evictions at U level cascade to members.
        val removedU = filterFrontier.evictDominatedBy(oIn)
        filterFrontier.insert(oIn)
        removedU.foreach(gone => userFrontiers.valuesIterator.foreach(_.remove(gone.ts)))
        userFrontiers.foreach { case (uid, pc) =>
          if (!pc.dominatesNew(oIn)) {
            pc.evictDominatedBy(oIn)
            pc.insert(oIn)
            targets += uid
          }
        }
      }
      SlidingWindowOps.refreshBuffer(buffer, cluster.filterRels, oIn, counter)
      targets.toSet
    }

    def frontiers: Map[Int, Set[Long]] = userFrontiers.map { case (u, f) => u -> f.ids }
  }

  def run(clusters: Seq[Cluster], objects: Seq[Obj], window: Int,
          snapshotEvery: Int = Int.MaxValue): SWRunResult = {
    val t0 = System.nanoTime()
    val counters = clusters.map(_ => new OpCounter)
    val states = clusters.zip(counters).map { case (c, k) => new ClusterState(c, k) }
    val sorted = objects.sortBy(_.ts)
    val emissions = mutable.LinkedHashMap.empty[Long, Set[Int]]
    val snapshots = mutable.ArrayBuffer.empty[Map[Int, Set[Long]]]
    sorted.zipWithIndex.foreach { case (o, i) =>
      if (i >= window) {
        val outTs = sorted(i - window).ts
        states.foreach { st =>
          st.onExpiry(outTs).foreach { case (uid, promoted) =>
            promoted.foreach(p =>
              emissions.updateWith(p.ts)(prev => Some(prev.getOrElse(Set.empty) + uid)))
          }
        }
      }
      val targets = states.foldLeft(Set.empty[Int])(_ ++ _.onArrival(o))
      emissions.updateWith(o.ts)(prev => Some(prev.getOrElse(Set.empty) ++ targets))
      if ((i + 1) % snapshotEvery == 0)
        snapshots += states.flatMap(_.frontiers).toMap
    }
    SWRunResult(emissions.toSeq.map { case (ts, us) => Emission(ts, us) },
      states.flatMap(_.frontiers).toMap,
      snapshots.toSeq, counters.map(_.comparisons).sum, System.nanoTime() - t0)
  }
}
