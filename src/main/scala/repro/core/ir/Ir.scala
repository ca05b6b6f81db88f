package repro.core.ir

/** Portable relational IR for SPJ (select-project-join) subexpressions.
  *
  * This is the logical-plan representation GEqO operates on (§2.1 of the
  * paper): a tree of Scan / Filter / Join / Project nodes whose subtrees are
  * the *subexpressions* of a query. Predicates are kept syntactic (scalar
  * expression trees) so that semantically-equivalent-but-different-looking
  * plans stay different-looking all the way into featurization; semantic
  * normalization lives in [[Canon]].
  */
object Ir {

  /** A column qualified by the alias of the base-table atom it comes from. */
  final case class ColRef(table: String, column: String) {
    def sql: String = s"$table.$column"
    override def toString: String = sql
  }

  /** Scalar expressions appearing in predicates: columns, literals, +/-. */
  sealed trait Scalar {
    def cols: Set[ColRef] = this match {
      case Col(r)    => Set(r)
      case Lit(_)    => Set.empty
      case Add(a, b) => a.cols ++ b.cols
      case Sub(a, b) => a.cols ++ b.cols
    }
  }
  final case class Col(ref: ColRef)        extends Scalar
  final case class Lit(v: Double)          extends Scalar
  final case class Add(a: Scalar, b: Scalar) extends Scalar
  final case class Sub(a: Scalar, b: Scalar) extends Scalar

  /** Comparison operators (conjunctive SPJ class; no ≠ / OR / IN — §9.1). */
  sealed abstract class CmpOp(val sql: String) {
    /** Operator obtained by swapping the operand sides (a op b ⟺ b flip(op) a). */
    def flipped: CmpOp = this match {
      case Lt => Gt
      case Le => Ge
      case Eq => Eq
      case Ge => Le
      case Gt => Lt
    }
  }
  case object Lt extends CmpOp("<")
  case object Le extends CmpOp("<=")
  case object Eq extends CmpOp("=")
  case object Ge extends CmpOp(">=")
  case object Gt extends CmpOp(">")
  val AllOps: IndexedSeq[CmpOp] = IndexedSeq(Lt, Le, Eq, Ge, Gt)

  /** A single comparison predicate. Conjunctions are expressed as stacked
    * [[Filter]] nodes, matching the paper's canonicalization of n-clause
    * predicates into n single-clause operators (§3.1).
    */
  final case class Pred(left: Scalar, op: CmpOp, right: Scalar) {
    def cols: Set[ColRef] = left.cols ++ right.cols
    /** Swap operand sides without changing meaning. */
    def flip: Pred = Pred(right, op.flipped, left)
  }

  /** Join types tracked by the encoder (the generator emits Inner only;
    * Left/Semi slots exist so the NV layout matches the paper's J_W).
    */
  sealed abstract class JoinType(val name: String)
  case object Inner    extends JoinType("inner")
  case object LeftJt   extends JoinType("left")
  case object SemiJt   extends JoinType("semi")
  val AllJoinTypes: IndexedSeq[JoinType] = IndexedSeq(Inner, LeftJt, SemiJt)

  /** Logical plan nodes. */
  sealed trait Plan {
    /** Output columns, in order. Non-Project nodes output every input column
      * left-to-right, so a subtree is unambiguously executable (§2.1).
      */
    def output: Seq[ColRef] = this match {
      case Scan(t, a, cols)  => cols.map(ColRef(a, _))
      case Filter(_, c)      => c.output
      case Join(_, l, r, _)  => l.output ++ r.output
      case Project(cols, _)  => cols
    }

    /** Base-table atoms of this subtree, left-to-right. */
    def atoms: Seq[Scan] = this match {
      case s: Scan          => Seq(s)
      case Filter(_, c)     => c.atoms
      case Join(_, l, r, _) => l.atoms ++ r.atoms
      case Project(_, c)    => c.atoms
    }

    def children: Seq[Plan] = this match {
      case _: Scan          => Seq.empty
      case Filter(_, c)     => Seq(c)
      case Join(_, l, r, _) => Seq(l, r)
      case Project(_, c)    => Seq(c)
    }

    /** Number of operator nodes, ops(q) in the paper. */
    def numOps: Int = 1 + children.map(_.numOps).sum

    /** All subtrees rooted at each node: S(Q) in §2.1 (includes this plan). */
    def subexpressions: Seq[Plan] = this +: children.flatMap(_.subexpressions)
  }

  /** Leaf scan of base table `table` under alias `alias`; `columns` is the
    * table's column list (carried so `output` needs no catalog access).
    */
  final case class Scan(table: String, alias: String, columns: Seq[String]) extends Plan
  final case class Filter(pred: Pred, child: Plan)                          extends Plan
  final case class Join(jt: JoinType, left: Plan, right: Plan, cond: Pred)  extends Plan
  final case class Project(cols: Seq[ColRef], child: Plan)                  extends Plan
}
