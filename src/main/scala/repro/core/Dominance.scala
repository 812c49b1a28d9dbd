package repro.core

/** An object in the stream: `ts` is both its identity and its timestamp
  * (the paper uses subscripts as timestamps, Sec. VII); `attrs(d)` is the
  * integer-encoded value of attribute `d`.
  */
final case class Obj(ts: Long, attrs: Array[Int]) extends Serializable {
  override def equals(o: Any): Boolean = o match {
    case x: Obj => x.ts == ts && x.attrs.sameElements(attrs)
    case _      => false
  }
  override def hashCode: Int = ts.hashCode
  override def toString: String = s"Obj($ts, ${attrs.mkString("<", ",", ">")})"
}

/** Mutable counter for the paper's "work done" metric: the number of
  * object-pair dominance comparisons performed.
  */
final class OpCounter extends Serializable {
  var comparisons: Long = 0L
  def reset(): Unit = comparisons = 0L
}

/** Object dominance under a vector of per-attribute preference relations
  * (paper Def. 2).
  */
object Dominance {
  /** `a` dominates `b`. */
  val Dominates = 1
  /** `b` dominates `a`. */
  val DominatedBy = -1
  /** Neither dominates (some attribute incomparable or trade-off). */
  val Incomparable = 0
  /** Equal on every attribute (Def. 2 "identical"). */
  val Identical = 2

  /** Four-way comparison of `a` vs `b` under `prefs` (one relation per
    * attribute). Bumps `counter` once per call.
    */
  def compare(prefs: Array[PrefRelation], a: Array[Int], b: Array[Int],
              counter: OpCounter): Int = {
    counter.comparisons += 1
    var aBetter = false; var bBetter = false
    var d = 0
    while (d < prefs.length) {
      val x = a(d); val y = b(d)
      if (x != y) {
        if (prefs(d).prefers(x, y)) aBetter = true
        else if (prefs(d).prefers(y, x)) bBetter = true
        else return Incomparable // incomparable attribute values ⇒ no dominance
      }
      d += 1
    }
    if (aBetter && bBetter) Incomparable
    else if (aBetter) Dominates
    else if (bBetter) DominatedBy
    else Identical
  }

  /** `a ≻ b` under `prefs`. */
  def dominates(prefs: Array[PrefRelation], a: Array[Int], b: Array[Int],
                counter: OpCounter): Boolean =
    compare(prefs, a, b, counter) == Dominates
}
