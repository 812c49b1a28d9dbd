package repro.core

import scala.collection.mutable

/** A cluster of users sharing computation (Sec. IV / VI): `filterRels` is
  * the virtual user's relation vector — the exact common preference
  * relation `≻_U` (Def. 5) for FilterThenVerifyExact, or the approximate
  * common relation `≻_aU` (Def. 8) for FilterThenVerifyApprox.
  */
final case class Cluster(clusterId: Int,
                         filterRels: Array[PrefRelation],
                         members: Seq[UserPrefs]) extends Serializable

/** Algorithm 2 (FilterThenVerify): maintain one filter frontier `P_U` per
  * cluster; only objects surviving the filter are verified against each
  * member's own frontier. Evictions at the cluster level cascade to member
  * frontiers (an object dominated w.r.t. `≻_U` is dominated for every
  * member, Thm. 2).
  */
object FilterThenVerify {

  /** Mutable state of a single cluster during a run. */
  final class ClusterState(val cluster: Cluster, val counter: OpCounter = new OpCounter)
      extends Serializable {
    val filterFrontier = new Frontier(cluster.filterRels, counter)
    val userFrontiers: Map[Int, Frontier] =
      cluster.members.map(u => u.userId -> new Frontier(u.rels, counter)).toMap

    /** Process one arrival; returns the cluster members for whom `o` is
      * Pareto-optimal (their contribution to `C_o`).
      */
    def onArrival(o: Obj): Set[Int] = {
      val res = filterFrontier.update(o) // updateParetoFrontierU
      // Cascade cluster-level evictions to member frontiers (Alg. 2,
      // Procedure updateParetoFrontierU lines 4-7).
      res.removed.foreach(gone => userFrontiers.valuesIterator.foreach(_.remove(gone.ts)))
      if (!res.isPareto) Set.empty
      else userFrontiers.iterator.collect {
        case (uid, f) if f.update(o).isPareto => uid
      }.toSet
    }

    def frontiers: Map[Int, Set[Long]] = userFrontiers.map { case (u, f) => u -> f.ids }
  }

  /** Replay `objects` in timestamp order over all clusters. */
  def run(clusters: Seq[Cluster], objects: Seq[Obj]): RunResult = {
    val t0 = System.nanoTime()
    val states = clusters.map(new ClusterState(_))
    val sorted = objects.sortBy(_.ts)
    val emissions = sorted.map { o =>
      Emission(o.ts, states.foldLeft(Set.empty[Int])(_ ++ _.onArrival(o)))
    }
    RunResult(emissions,
      states.flatMap(_.frontiers).toMap,
      states.map(_.counter.comparisons).sum,
      System.nanoTime() - t0)
  }
}
