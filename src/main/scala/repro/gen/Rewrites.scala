package repro.gen

import repro.core.ir.Canon
import repro.core.ir.Canon.{NLe, NLt, NormPred}
import repro.core.ir.Ir._
import repro.verifier.{Dbm, DiffLogic}
import scala.util.Random

/** Semantic-preserving rewrites — the WeTune-substitute rule set (§5 of the
  * paper; DESIGN.md "Substitutions"). A variant is produced by flattening
  * the plan to its normal form, optionally perturbing the conjunct set with
  * *equivalence-preserving* edits (implied-conjunct injection, redundant-
  * conjunct removal — the Figure-1 pattern), stochastically re-rendering
  * each predicate's syntax, and re-assembling a random plan tree.
  */
object Rewrites {

  /** A light variant: same syntactic predicates, different plan shape
    * (join commutativity/associativity, filter push-down/pull-up, conjunct
    * reorder). Detectable by a decent optimizer.
    */
  def lightVariant(plan: Plan, rng: Random): Plan = {
    val flat  = Canon.flatten(plan)
    val preds = repro.core.ir.Sql.collectPreds(plan).toVector
    // Half the time keep the join order and only move/reorder predicates —
    // the kind of rewrite a rule-based optimizer normalizes away.
    QueryGen.assemble(Spec(flat.atoms.toVector, preds, flat.proj.toVector), rng,
                      shuffleAtoms = rng.nextBoolean())
  }

  /** A heavy variant: conjunct-set perturbation + full syntactic re-render.
    * Semantically equivalent to `plan` but beyond signature/optimizer reach.
    */
  def heavyVariant(plan: Plan, rng: Random): Plan = {
    val flat = Canon.flatten(plan)
    var conj: Vector[NormPred] = flat.conjuncts

    if (rng.nextDouble() < 0.6) conj = injectImplied(conj, rng).getOrElse(conj)
    if (rng.nextDouble() < 0.4) conj = removeRedundant(conj, rng).getOrElse(conj)

    val preds = conj.map(Canon.renderPred(_, rng))
    QueryGen.assemble(Spec(flat.atoms.toVector, preds, flat.proj.toVector), rng)
  }

  def variant(plan: Plan, rng: Random, heavy: Boolean): Plan =
    if (heavy) heavyVariant(plan, rng) else lightVariant(plan, rng)

  /** Add a conjunct derived from the DBM closure (optionally slackened), so
    * the new set is equivalent to the old: e.g. from {x > y + a, y > b}
    * derive x > a + b.
    */
  def injectImplied(conj: Vector[NormPred], rng: Random): Option[Vector[NormPred]] = {
    val dbm  = Dbm(conj).close()
    val vars = conj.flatMap(_.cols).distinct
    if (vars.isEmpty) return None
    val slots: Seq[(Option[ColRef], Option[ColRef])] =
      (vars.map(v => (Some(v), Option.empty[ColRef])) ++
       vars.map(v => (Option.empty[ColRef], Some(v))) ++
       (for (u <- vars; v <- vars if u != v) yield (Some(u), Some(v))))
    val candidates = rng.shuffle(slots).iterator.flatMap { case (u, v) =>
      val (c, isStrict) = dbm.bound(u, v)
      if (c.isInfinity) None
      else {
        val slack = rng.nextInt(6).toDouble
        // u − v ≤ c + slack  ⇒  lin = u − v − (c + slack) ⊲ 0
        val lin = Canon.Lin(
          (u.map(_ -> 1.0).toMap) ++ (v.map(_ -> -1.0).toMap),
          -(c + slack))
        val op  = if (isStrict && slack == 0) NLt else NLe
        val np  = Canon.toNorm(lin, op)
        if (conj.contains(np)) None else Some(np)
      }
    }
    candidates.nextOption().map(np => conj :+ np)
  }

  /** Remove one conjunct implied by the others, when such exists. */
  def removeRedundant(conj: Vector[NormPred], rng: Random): Option[Vector[NormPred]] = {
    val idxs = rng.shuffle(conj.indices.toVector)
    idxs.find(i => DiffLogic.redundant(conj, i))
      .map(i => conj.patch(i, Nil, 1))
  }
}
