package repro.core

import scala.collection.mutable

/** CPS-style poset embedding (Zhang et al. [32], the paper's poset
  * manipulation layer): embed a strict partial order into a product of
  * chains so that dominance becomes a numeric coordinate-wise test.
  *
  * Given a chain partition `C_1, ..., C_k` of the domain, value `v` maps to
  * the vector `(|↓v ∩ C_1|, ..., |↓v ∩ C_k|)` where `↓v = {v} ∪ worse(v)`.
  * This is an exact order embedding: `x ⪰ y` in the poset iff
  * `coord(x) ≥ coord(y)` component-wise (the chain containing `x` breaks
  * ties in the reverse direction whenever `x ⋡ y`).
  */
final class Cps private (val rel: PrefRelation, val chains: Vector[Vector[Int]],
                         val coords: Array[Array[Int]]) extends Serializable {

  def numChains: Int = chains.size

  /** `x ≻ y` decided purely from chain coordinates. */
  def prefersByCoords(x: Int, y: Int): Boolean = {
    var ge = true; var strict = false; var i = 0
    val cx = coords(x); val cy = coords(y)
    while (i < cx.length && ge) {
      if (cx(i) < cy(i)) ge = false
      else if (cx(i) > cy(i)) strict = true
      i += 1
    }
    ge && strict
  }
}

object Cps {

  /** Greedy chain partition: repeatedly peel a maximal chain (longest path
    * in the Hasse DAG). Not minimal-width (Dilworth would need matching),
    * but any chain partition yields an exact embedding, which is what the
    * correctness of dominance tests needs.
    */
  def apply(rel: PrefRelation): Cps = {
    val n = rel.domainSize
    val remaining = mutable.Set.from(0 until n)
    val chains = Vector.newBuilder[Vector[Int]]
    while (remaining.nonEmpty) {
      // Longest descending path within `remaining` via memoized DFS.
      val memo = mutable.Map.empty[Int, List[Int]]
      def longest(v: Int): List[Int] = memo.getOrElseUpdate(v, {
        val succ = rel.worse(v).iterator.filter(remaining).map(longest)
        val best = succ.foldLeft(List.empty[Int])((a, b) => if (b.size > a.size) b else a)
        v :: best
      })
      val chain = remaining.iterator.map(longest).maxBy(_.size)
      chains += chain.toVector
      remaining --= chain
    }
    val cs = chains.result()
    val coords = Array.tabulate(n) { v =>
      cs.iterator.map(c => c.count(u => u == v || rel.prefers(v, u))).toArray
    }
    new Cps(rel, cs, coords)
  }
}
