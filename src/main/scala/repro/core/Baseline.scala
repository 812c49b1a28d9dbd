package repro.core

import scala.collection.mutable

/** A user with integer id and one preference relation per attribute. */
final case class UserPrefs(userId: Int, rels: Array[PrefRelation]) extends Serializable

/** Per-arrival dissemination decision: the target users of object `ts`
  * at the moment of its arrival (`C_o` in the paper).
  */
final case class Emission(ts: Long, users: Set[Int]) extends Serializable

/** Outcome of replaying a whole object stream: the per-arrival emissions,
  * the final per-user Pareto frontiers (object ids), and the work done.
  */
final case class RunResult(emissions: Seq[Emission],
                           frontiers: Map[Int, Set[Long]],
                           comparisons: Long,
                           wallNanos: Long) extends Serializable

/** Algorithm 1 (Baseline): upon each arrival, maintain every user's Pareto
  * frontier independently and collect the users for whom the new object is
  * Pareto-optimal.
  */
object Baseline {

  /** Mutable per-user state for one run. */
  final class State(users: Seq[UserPrefs], val counter: OpCounter = new OpCounter)
      extends Serializable {
    val frontiers: Map[Int, Frontier] =
      users.map(u => u.userId -> new Frontier(u.rels, counter)).toMap

    /** Process one arrival; returns the target users of `o`. */
    def onArrival(o: Obj): Set[Int] =
      frontiers.iterator.collect {
        case (uid, f) if f.update(o).isPareto => uid
      }.toSet
  }

  /** Replay `objects` in timestamp order for all `users`. */
  def run(users: Seq[UserPrefs], objects: Seq[Obj]): RunResult = {
    val t0 = System.nanoTime()
    val st = new State(users)
    val emissions = objects.sortBy(_.ts).map(o => Emission(o.ts, st.onArrival(o)))
    RunResult(emissions, st.frontiers.map { case (u, f) => u -> f.ids },
      st.counter.comparisons, System.nanoTime() - t0)
  }
}
