package repro.verifier

import repro.core.ir.Ir.ColRef
import repro.core.ir.Canon.{NEq, NLe, NLt, NormPred}

/** Difference-bound-matrix decision procedure for conjunctions of
  * difference-logic constraints over the reals:
  * `x − y ⊲ c`, `x ⊲ c`, `x = y + c` with ⊲ ∈ {<, ≤}.
  *
  * This is the proof engine of the automated verifier (the paper uses
  * SPES + Z3; see DESIGN.md "Substitutions"). Bounds carry strictness, and
  * Floyd–Warshall closure detects negative (or zero-weight strict) cycles —
  * sound and complete for this constraint class over ℝ, which is exactly the
  * class the workload generator emits.
  */
final class Dbm private (val vars: IndexedSeq[ColRef]) {
  // Index 0 is the implicit ZERO variable; variable i is vars(i - 1).
  private val n: Int = vars.size + 1
  private val idx: Map[ColRef, Int] = vars.zipWithIndex.map { case (c, i) => c -> (i + 1) }.toMap

  /** w(u,v) = least c with `u − v ≤ c` (strict(u,v) ⇒ `<`). */
  private val w      = Array.fill(n * n)(Double.PositiveInfinity)
  private val strict = Array.fill(n * n)(false)
  private var contradiction = false

  @inline private def at(u: Int, v: Int): Int = u * n + v

  private def tighten(u: Int, v: Int, c: Double, s: Boolean): Unit = {
    val i = at(u, v)
    if (c < w(i) || (c == w(i) && s)) { w(i) = c; strict(i) = s }
  }

  /** Assert `np` (must be in difference form). */
  def add(np: NormPred): Unit = {
    val s = np.op == NLt
    np.coefs match {
      case Nil =>
        // Constant predicate `c ⊲ 0`.
        val holds = np.op match {
          case NLt => np.const < 0
          case NLe => np.const <= 0
          case NEq => np.const == 0
        }
        if (!holds) contradiction = true
      case (x, a) :: Nil =>
        val xi = idx(x)
        np.op match {
          case NEq =>
            // a·x + c = 0 ⇒ x = -c/a; a ∈ {±1}
            val v = -np.const / a
            tighten(xi, 0, v, s = false); tighten(0, xi, -v, s = false)
          case _ =>
            // a=+1:  x − 0 ⊲ −c ;  a=−1:  0 − x ⊲ −c
            if (a > 0) tighten(xi, 0, -np.const, s) else tighten(0, xi, -np.const, s)
        }
      case (x, a) :: (y, _) :: Nil =>
        val (u, v) = if (a > 0) (idx(x), idx(y)) else (idx(y), idx(x))
        np.op match {
          case NEq =>
            tighten(u, v, -np.const, s = false); tighten(v, u, np.const, s = false)
          case _ => tighten(u, v, -np.const, s)
        }
      case other =>
        throw new IllegalArgumentException(s"not difference form: $other")
    }
  }

  /** Floyd–Warshall closure; returns this. */
  def close(): Dbm = {
    var k = 0
    while (k < n) {
      var u = 0
      while (u < n) {
        val wk = w(at(u, k))
        if (!wk.isInfinity) {
          val sk = strict(at(u, k))
          var v = 0
          while (v < n) {
            val kv = w(at(k, v))
            if (!kv.isInfinity) tighten(u, v, wk + kv, sk || strict(at(k, v)))
            v += 1
          }
        }
        u += 1
      }
      k += 1
    }
    this
  }

  /** UNSAT iff a negative cycle (or zero-weight strict cycle) exists. Call
    * after [[close]].
    */
  def unsat: Boolean = {
    if (contradiction) return true
    var u = 0
    while (u < n) {
      val i = at(u, u)
      if (w(i) < 0 || (w(i) == 0 && strict(i))) return true
      u += 1
    }
    false
  }

  /** Closed bound `u − v ≤/< c` between two columns (or a column and the
    * ZERO var when one side is None). Infinity when unconstrained.
    */
  def bound(u: Option[ColRef], v: Option[ColRef]): (Double, Boolean) = {
    val ui = u.fold(0)(idx); val vi = v.fold(0)(idx)
    (w(at(ui, vi)), strict(at(ui, vi)))
  }
}

object Dbm {
  def apply(preds: Seq[NormPred]): Dbm = {
    val vars = preds.flatMap(_.cols).distinct.sortBy(c => (c.table, c.column)).toIndexedSeq
    val d = new Dbm(vars)
    preds.foreach(d.add)
    d
  }
}

/** Conjunction-level queries over the DBM engine. */
object DiffLogic {

  def satisfiable(preds: Seq[NormPred]): Boolean = !Dbm(preds).close().unsat

  /** `preds ⟹ q` via UNSAT(preds ∧ ¬q). `¬(lin = 0)` splits into two
    * strict checks.
    */
  def implies(preds: Seq[NormPred], q: NormPred): Boolean = {
    import repro.core.ir.Canon
    def unsatWith(extra: NormPred): Boolean = !satisfiable(preds :+ extra)
    q.op match {
      case NLt => unsatWith(Canon.toNorm(q.linForm.negate, NLe)) // ¬(l<0) ⇔ −l ≤ 0
      case NLe => unsatWith(Canon.toNorm(q.linForm.negate, NLt)) // ¬(l≤0) ⇔ −l < 0
      case NEq =>
        unsatWith(Canon.toNorm(q.linForm, NLt)) &&
        unsatWith(Canon.toNorm(q.linForm.negate, NLt))
    }
  }

  /** Mutual implication of two conjunct sets (assumed over the same columns
    * after atom renaming).
    */
  def equivalent(p1: Seq[NormPred], p2: Seq[NormPred]): Boolean = {
    val s1 = satisfiable(p1); val s2 = satisfiable(p2)
    if (!s1 && !s2) true
    else if (s1 != s2) false
    else p2.forall(implies(p1, _)) && p1.forall(implies(p2, _))
  }

  /** Is conjunct `i` implied by the remaining conjuncts? */
  def redundant(preds: Seq[NormPred], i: Int): Boolean = {
    val rest = preds.zipWithIndex.collect { case (p, j) if j != i => p }
    implies(rest, preds(i))
  }
}
