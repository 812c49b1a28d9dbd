package repro.core

import scala.collection.mutable

/** Similarity measures over clusters of users whose preferences are strict
  * partial orders (paper Sec. V exact measures, Sec. VI-C approximate
  * measures), plus conventional hierarchical agglomerative clustering with
  * a dendrogram branch cut `θ(h)` (Def. 7).
  */
object Clustering {

  /** Per-attribute representation of a cluster during clustering:
    *   - `common`: the common preference relation `≻_U^d` (Def. 5);
    *   - `freq`: Σ over members of tuple indicators (Sec. VI-C vectors);
    *   - `wfreq`: Σ over members of indicator × member's weight of the
    *     better value in the member's own relation (Ex. 14).
    * Sums (not averages) are kept so merging clusters is additive.
    */
  final case class AttrRep(common: PrefRelation,
                           freq: Map[(Int, Int), Double],
                           wfreq: Map[(Int, Int), Double])

  final case class ClusterRep(members: Vector[UserPrefs], attrs: Vector[AttrRep]) {
    def size: Int = members.size
  }

  def singleton(u: UserPrefs): ClusterRep =
    ClusterRep(Vector(u), u.rels.toVector.map { rel =>
      val f = rel.tuples.map(t => t -> 1.0).toMap
      val w = rel.tuples.map { case (x, y) => (x, y) -> rel.weight(x) }.toMap
      AttrRep(rel, f, w)
    })

  def merge(a: ClusterRep, b: ClusterRep): ClusterRep =
    ClusterRep(a.members ++ b.members,
      a.attrs.zip(b.attrs).map { case (x, y) =>
        AttrRep(x.common.intersect(y.common),
          addMaps(x.freq, y.freq), addMaps(x.wfreq, y.wfreq))
      })

  private def addMaps(a: Map[(Int, Int), Double], b: Map[(Int, Int), Double]) =
    (a.keySet ++ b.keySet).iterator.map(k => k -> (a.getOrElse(k, 0.0) + b.getOrElse(k, 0.0))).toMap

  // ---------------------------------------------------------------- exact

  /** Eq. 2: intersection size `|≻_U1^d ∩ ≻_U2^d|`. */
  def simIntersectionD(a: PrefRelation, b: PrefRelation): Double =
    a.intersect(b).size.toDouble

  /** Eq. 3: Jaccard similarity of the two common relations. */
  def simJaccardD(a: PrefRelation, b: PrefRelation): Double = {
    val inter = a.intersect(b).size
    val union = a.size + b.size - inter
    if (union == 0) 0.0 else inter.toDouble / union
  }

  /** Eq. 4: weighted intersection size — for each common tuple `(v, v')`,
    * the average of `v`'s weights in the two relations.
    */
  def simWeightedIntersectionD(a: PrefRelation, b: PrefRelation): Double =
    a.intersect(b).tuples.iterator.map { case (v, _) => (a.weight(v) + b.weight(v)) / 2.0 }.sum

  /** Eq. 5: weighted Jaccard — weighted intersection over weighted union
    * (tuples exclusive to one relation contribute that relation's weight
    * of the better value).
    */
  def simWeightedJaccardD(a: PrefRelation, b: PrefRelation): Double = {
    val wi = simWeightedIntersectionD(a, b)
    val onlyA = a.tuples.iterator.filter { case (x, y) => !b.prefers(x, y) }
      .map { case (v, _) => a.weight(v) }.sum
    val onlyB = b.tuples.iterator.filter { case (x, y) => !a.prefers(x, y) }
      .map { case (v, _) => b.weight(v) }.sum
    val denom = onlyA + onlyB + wi
    if (denom == 0) 0.0 else wi / denom
  }

  // ----------------------------------------------------------- approximate

  /** Eq. 6: multiset Jaccard `Σ min / Σ max` over per-member tuple
    * frequency vectors (Sec. VI-C Ex. 13). `fa`/`fb` are indicator sums;
    * `na`/`nb` the member counts (vectors are sums / count).
    */
  def simVecJaccard(fa: Map[(Int, Int), Double], na: Int,
                    fb: Map[(Int, Int), Double], nb: Int): Double = {
    val keys = fa.keySet ++ fb.keySet
    var mins = 0.0; var maxs = 0.0
    keys.foreach { k =>
      val x = fa.getOrElse(k, 0.0) / na
      val y = fb.getOrElse(k, 0.0) / nb
      mins += math.min(x, y); maxs += math.max(x, y)
    }
    if (maxs == 0) 0.0 else mins / maxs
  }

  // -------------------------------------------------------------- measures

  sealed trait Measure { def name: String }
  case object SimI  extends Measure { val name = "intersection" }
  case object SimJ  extends Measure { val name = "jaccard" }
  case object SimWI extends Measure { val name = "weighted-intersection" }
  case object SimWJ extends Measure { val name = "weighted-jaccard" }
  case object SimVecJ  extends Measure { val name = "vector-jaccard" }
  case object SimVecWJ extends Measure { val name = "weighted-vector-jaccard" }

  /** Combined cluster similarity (Eq. 1), normalized to [0, 1] by averaging
    * per-attribute similarities so the branch cut `h ∈ (0, 1]` of Def. 7 is
    * meaningful across measures. Unbounded measures (`sim_i`, `sim_wi`) are
    * normalized per attribute by the maximum possible relation size
    * `m(m-1)/2` (a full chain's closure).
    */
  def similarity(measure: Measure, a: ClusterRep, b: ClusterRep): Double = {
    val perAttr = a.attrs.zip(b.attrs).map { case (x, y) =>
      val m = x.common.domainSize
      val cap = m * (m - 1) / 2.0
      measure match {
        case SimI  => simIntersectionD(x.common, y.common) / cap
        case SimJ  => simJaccardD(x.common, y.common)
        case SimWI => simWeightedIntersectionD(x.common, y.common) / cap
        case SimWJ => simWeightedJaccardD(x.common, y.common)
        case SimVecJ  => simVecJaccard(x.freq, a.size, y.freq, b.size)
        case SimVecWJ => simVecJaccard(x.wfreq, a.size, y.wfreq, b.size)
      }
    }
    perAttr.sum / perAttr.size
  }

  // ------------------------------------------------------------ dendrogram

  /** One agglomerative merge: the two clusters (by current index snapshot)
    * merged and the similarity at which they merged.
    */
  final case class Merge(left: Set[Int], right: Set[Int], sim: Double)

  /** Full dendrogram: user ids plus the merge sequence (greedy max-sim,
    * conventional hierarchical agglomerative clustering [10]).
    */
  final case class Dendrogram(users: Seq[UserPrefs], merges: Seq[Merge]) {
    /** Branch cut `θ(h)`: apply merges in order while their similarity is
      * ≥ h; h = 1 yields all singletons (Ex. 10).
      */
    def cut(h: Double): Seq[Set[Int]] = {
      val parent = mutable.Map.from(users.map(u => u.userId -> u.userId))
      def find(x: Int): Int = if (parent(x) == x) x else { val r = find(parent(x)); parent(x) = r; r }
      merges.iterator.takeWhile(_.sim >= h).foreach { m =>
        parent(find(m.left.head)) = find(m.right.head)
      }
      users.groupBy(u => find(u.userId)).values.map(_.map(_.userId).toSet).toSeq
    }
  }

  /** Build the dendrogram by greedy agglomeration under `measure`.
    * O(k² · simCost); fine for the ≤ 1,000-user scales of the paper.
    */
  def dendrogram(users: Seq[UserPrefs], measure: Measure): Dendrogram = {
    val active = mutable.Map.from(users.zipWithIndex.map { case (u, i) => i -> singleton(u) })
    val sims = mutable.Map.empty[(Int, Int), Double]
    def key(i: Int, j: Int) = if (i < j) (i, j) else (j, i)
    for (i <- active.keys; j <- active.keys if i < j)
      sims(key(i, j)) = similarity(measure, active(i), active(j))
    var nextId = users.size
    val merges = mutable.ArrayBuffer.empty[Merge]
    while (active.size > 1) {
      // Deterministic tie-break (highest sim, then lowest ids).
      val ((i, j), s) = sims.minBy { case ((a, b), v) => (-v, a, b) }
      val merged = merge(active(i), active(j))
      merges += Merge(active(i).members.map(_.userId).toSet,
                      active(j).members.map(_.userId).toSet, s)
      active.remove(i); active.remove(j)
      sims.filterInPlace { case ((a, b), _) => a != i && a != j && b != i && b != j }
      val id = nextId; nextId += 1
      active.keys.foreach(k => sims(key(k, id)) = similarity(measure, active(k), merged))
      active(id) = merged
    }
    Dendrogram(users, merges.toSeq)
  }

  /** Common preference relation vector of a member set (per attribute). */
  def commonRels(members: Seq[UserPrefs]): Array[PrefRelation] = {
    val d = members.head.rels.length
    Array.tabulate(d)(i => PrefRelation.commonOf(members.map(_.rels(i))))
  }

  /** Materialize clusters for a cut: exact common relations as the filter. */
  def exactClusters(users: Seq[UserPrefs], dendro: Dendrogram, h: Double): Seq[Cluster] = {
    val byId = users.map(u => u.userId -> u).toMap
    dendro.cut(h).zipWithIndex.map { case (ids, cid) =>
      val members = ids.toSeq.sorted.map(byId)
      Cluster(cid, commonRels(members), members)
    }
  }
}
