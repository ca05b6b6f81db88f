package repro.baseline

import repro.SparkSpec
import repro.core.ir.Catalogs
import repro.gen.{QueryGen, Rewrites}
import repro.verifier.Verifier
import scala.util.Random

class OptimizerEquivSpec extends SparkSpec {

  private val schema = Catalogs.tpchLite
  private lazy val opt: OptimizerEquiv = {
    OptimizerEquiv.registerEmptyTables(spark, schema)
    new OptimizerEquiv(spark)
  }

  test("identical plans are optimizer-equivalent") {
    for (seed <- 0 until 10) {
      val rng = new Random(seed)
      val p = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
      assert(opt.equivalent(p, p), s"seed=$seed")
    }
  }

  test("optimizer detects predicate-placement rewrites (same join order)") {
    var caught = 0
    val n = 20
    for (seed <- 0 until n) {
      val rng = new Random(seed)
      val base = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
      val flat = repro.core.ir.Canon.flatten(base)
      val preds = repro.core.ir.Sql.collectPreds(base).toVector
      val v = QueryGen.assemble(repro.gen.Spec(flat.atoms.toVector, preds,
        flat.proj.toVector), rng, shuffleAtoms = false)
      if (opt.equivalent(base, v)) caught += 1
    }
    assert(caught >= n * 3 / 4, s"optimizer caught only $caught/$n placement rewrites")
  }

  test("optimizer misses implied-conjunct rewrites (the GEqO gap)") {
    var missed = 0
    var total = 0
    var seed = 0
    while (total < 20 && seed < 200) {
      val rng = new Random(seed)
      val base = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
      val conj = repro.core.ir.Canon.flatten(base).conjuncts
      Rewrites.injectImplied(conj, rng) match {
        case Some(augmented) if augmented.size > conj.size =>
          val flat = repro.core.ir.Canon.flatten(base)
          val preds = augmented.map(repro.core.ir.Canon.renderPred(_, rng))
          val v = QueryGen.assemble(repro.gen.Spec(flat.atoms.toVector, preds,
            flat.proj.toVector), rng, shuffleAtoms = false)
          total += 1
          if (!opt.equivalent(base, v)) missed += 1
        case _ =>
      }
      seed += 1
    }
    assert(missed >= total / 2, s"optimizer surprisingly caught ${total - missed}/$total")
  }

  test("optimizer equivalence is sound against the verifier") {
    val av = new Verifier()
    for (seed <- 0 until 30) {
      val rng = new Random(seed)
      val p = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
      val q = Rewrites.variant(p, rng, heavy = seed % 2 == 0)
      if (opt.equivalent(p, q)) assert(av.equivalent(p, q), s"seed=$seed")
    }
  }

  test("different constants are never optimizer-equivalent") {
    import repro.core.ir.Ir._
    val cols = schema.tableByName("lineitem").columnNames
    def mk(c: Double) = Project(Seq(ColRef("a0", "l_quantity")),
      Filter(Pred(Col(ColRef("a0", "l_quantity")), Gt, Lit(c)),
        Scan("lineitem", "a0", cols)))
    assert(!opt.equivalent(mk(5), mk(6)))
  }
}
