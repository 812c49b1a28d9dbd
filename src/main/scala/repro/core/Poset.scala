package repro.core

import scala.collection.immutable.BitSet
import scala.collection.mutable

/** A strict partial order over an integer-encoded attribute domain
  * `{0, ..., domainSize-1}` (paper Def. 1).
  *
  * Stored as its transitive closure: `worse(x)` is the set of values `y`
  * with `x ≻ y`. The closure form makes dominance checks O(1) and makes
  * intersection of relations (Def. 5 common preference relation) a plain
  * per-value set intersection — the intersection of two transitively
  * closed relations is transitively closed.
  */
final class PrefRelation private (val domainSize: Int, val worse: Array[BitSet])
    extends Serializable {

  /** `x ≻ y`? */
  def prefers(x: Int, y: Int): Boolean = worse(x)(y)

  /** All preference tuples `(better, worse)` in the closure. */
  def tuples: Seq[(Int, Int)] =
    for (x <- 0 until domainSize; y <- worse(x)) yield (x, y)

  /** Number of preference tuples `|≻|`. */
  lazy val size: Int = worse.iterator.map(_.size).sum

  /** Common preference relation with `other` (Def. 5): `≻_this ∩ ≻_other`. */
  def intersect(other: PrefRelation): PrefRelation = {
    require(other.domainSize == domainSize, "domain mismatch")
    new PrefRelation(domainSize, Array.tabulate(domainSize)(x => worse(x) & other.worse(x)))
  }

  /** Maximal values (Def. 6): values no other value is preferred to. */
  lazy val maximalValues: BitSet = {
    val dominated = worse.foldLeft(BitSet.empty)(_ | _)
    BitSet.fromSpecific((0 until domainSize).filterNot(dominated))
  }

  /** Hasse-diagram (transitive reduction) successors: `x → y` iff `x ≻ y`
    * and no `z` with `x ≻ z ≻ y`. Distances in the paper (Eq. 4, Ex. 8)
    * are shortest paths in the Hasse diagram, not the closure.
    */
  lazy val hasseSuccessors: Array[BitSet] =
    Array.tabulate(domainSize) { x =>
      worse(x).filterNot(y => worse(x).exists(z => z != y && worse(z)(y)))
    }

  /** Min shortest Hasse distance from any maximal value to `v`;
    * `Int.MaxValue` if unreachable (then `v` is itself maximal: distance 0).
    */
  lazy val minDistFromMaximal: Array[Int] = {
    val dist = Array.fill(domainSize)(Int.MaxValue)
    val queue = mutable.Queue.empty[Int]
    maximalValues.foreach { s => dist(s) = 0; queue += s }
    while (queue.nonEmpty) {
      val x = queue.dequeue()
      hasseSuccessors(x).foreach { y =>
        if (dist(x) + 1 < dist(y)) { dist(y) = dist(x) + 1; queue += y }
      }
    }
    dist
  }

  /** Weight of value `v` per Eq. 4: `1 / (minDistFromMaximal(v) + 1)`. */
  def weight(v: Int): Double = {
    val d = minDistFromMaximal(v)
    if (d == Int.MaxValue) 0.0 else 1.0 / (d + 1.0)
  }

  /** Would adding tuple `(x, y)` keep this a strict partial order?
    * Violations: reflexivity (`x == y`) or a cycle (`y ≻* x` already).
    */
  def canAdd(x: Int, y: Int): Boolean = x != y && !worse(y)(x) && x < domainSize && y < domainSize

  /** Closure of `this ∪ {(x, y)}`; caller must ensure [[canAdd]]. */
  def add(x: Int, y: Int): PrefRelation = {
    require(canAdd(x, y), s"adding ($x,$y) breaks the strict partial order")
    // New pairs: (a, b) for a ∈ {x} ∪ worse⁻¹(x), b ∈ {y} ∪ worse(y).
    val ups = BitSet.fromSpecific((0 until domainSize).filter(a => worse(a)(x))) + x
    val downs = worse(y) + y
    val next = worse.clone()
    ups.foreach(a => next(a) = next(a) | downs)
    new PrefRelation(domainSize, next)
  }

  override def equals(o: Any): Boolean = o match {
    case p: PrefRelation => p.domainSize == domainSize && p.worse.sameElements(worse)
    case _               => false
  }
  override def hashCode: Int = worse.toSeq.hashCode
  override def toString: String = s"PrefRelation($domainSize, ${tuples.mkString(", ")})"
}

object PrefRelation {

  /** The empty relation (no preferences — everything incomparable). */
  def empty(domainSize: Int): PrefRelation =
    new PrefRelation(domainSize, Array.fill(domainSize)(BitSet.empty))

  /** Build from arbitrary edges, taking the transitive closure.
    * Throws if the closure is not a strict partial order (a cycle exists).
    */
  def fromEdges(domainSize: Int, edges: Iterable[(Int, Int)]): PrefRelation = {
    val adj = Array.fill(domainSize)(BitSet.empty)
    edges.foreach { case (x, y) =>
      require(x != y, s"reflexive tuple ($x,$y)")
      require(x >= 0 && x < domainSize && y >= 0 && y < domainSize, s"value out of domain: ($x,$y)")
      adj(x) = adj(x) + y
    }
    // Warshall over BitSets.
    for (k <- 0 until domainSize; x <- 0 until domainSize)
      if (adj(x)(k)) adj(x) = adj(x) | adj(k)
    for (x <- 0 until domainSize)
      require(!adj(x)(x), s"cycle through value $x — not a strict partial order")
    new PrefRelation(domainSize, adj)
  }

  /** Is the given tuple set (after closure) a strict partial order? */
  def isStrictPartialOrder(domainSize: Int, edges: Iterable[(Int, Int)]): Boolean =
    try { fromEdges(domainSize, edges); true }
    catch { case _: IllegalArgumentException => false }

  /** Intersection of many relations — the common preference relation of a
    * cluster (Def. 5). Defined for a non-empty collection.
    */
  def commonOf(rels: Iterable[PrefRelation]): PrefRelation =
    rels.reduce(_ intersect _)
}
