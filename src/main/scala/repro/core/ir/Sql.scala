package repro.core.ir

import repro.core.ir.Ir._

/** Renders an IR plan to SQL executable by both Spark SQL and DuckDB.
  *
  * Inner-join SPJ trees render as a flattened `SELECT … FROM a, b WHERE …`
  * block — semantically identical to the tree for inner joins, and parseable
  * back through the Catalyst bridge. Every column occurrence is wrapped in
  * `CAST(… AS DOUBLE)`: the DuckDB oracle stores all columns as VARCHAR, and
  * the cast pins identical numeric semantics (and identical result
  * formatting) on both engines.
  */
object Sql {

  private def lit(v: Double): String =
    if (v == v.floor && !v.isInfinite) v.toLong.toString else v.toString

  def scalar(s: Scalar): String = s match {
    case Col(r)    => s"CAST(${r.sql} AS DOUBLE)"
    case Lit(v)    => lit(v)
    case Add(a, b) => s"(${scalar(a)} + ${scalar(b)})"
    case Sub(a, b) => s"(${scalar(a)} - ${scalar(b)})"
  }

  def pred(p: Pred): String = s"${scalar(p.left)} ${p.op.sql} ${scalar(p.right)}"

  /** Flattened SELECT for `plan`; output columns aliased c0..cn so Spark and
    * DuckDB agree on names (the Oracle requires identical aliases).
    */
  def render(plan: Plan): String = {
    val flat  = Canon.flatten(plan)
    val from  = flat.atoms.map(a => s"${a.table} AS ${a.alias}").mkString(", ")
    val proj  = flat.proj.zipWithIndex
      .map { case (c, i) => s"CAST(${c.sql} AS DOUBLE) AS c$i" }
      .mkString(", ")
    // Render the *original* syntactic conjuncts so optimizer/signature
    // baselines see the query as written, not pre-normalized.
    val conj = collectPreds(plan).map(pred)
    val where = if (conj.isEmpty) "" else conj.mkString(" WHERE ", " AND ", "")
    s"SELECT $proj FROM $from$where"
  }

  /** Syntactic predicates of the tree (filters + join conditions), in order. */
  def collectPreds(plan: Plan): Seq[Pred] = plan match {
    case _: Scan          => Seq.empty
    case Filter(p, c)     => collectPreds(c) :+ p
    case Join(_, l, r, p) => (collectPreds(l) ++ collectPreds(r)) :+ p
    case Project(_, c)    => collectPreds(c)
  }
}
