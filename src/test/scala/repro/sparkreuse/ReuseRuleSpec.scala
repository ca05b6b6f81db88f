package repro.sparkreuse

import org.apache.spark.sql.catalyst.plans.logical.LocalRelation
import repro.{SparkSpec, SynthData}
import repro.core.ir.{Catalogs, Sql}
import repro.gen.{QueryGen, Rewrites}
import repro.verifier.Verifier
import scala.util.Random

/** The computation-reuse story end-to-end: materialize one job's
  * subexpression, then run a *syntactically different but semantically
  * equivalent* second job and observe the optimizer rule substitute the
  * cached result — with identical query answers.
  */
class ReuseRuleSpec extends SparkSpec {

  private val schema = Catalogs.tpchLite
  private val av = new Verifier()

  private lazy val setup: (ReuseCache, ReuseRule) = {
    SynthData.tablesFor(spark, "tpch", 0.001)
      .foreach { case (n, df) => df.createOrReplaceTempView(n) }
    val cache = new ReuseCache
    val rule = new ReuseRule(cache,
      ReuseRule.bodyResolver(spark, schema.tables.map(_.name)), av)
    ReuseRule.install(spark, rule)
    (cache, rule)
  }

  private def canonRows(df: org.apache.spark.sql.DataFrame): Seq[String] =
    df.collect().toSeq.map(r => (0 until r.size).map(i => "" + r.get(i)).mkString("|")).sorted

  test("rule installs idempotently") {
    val (_, rule) = setup
    ReuseRule.install(spark, rule)
    assert(spark.experimental.extraOptimizations.count(_ eq rule) == 1)
  }

  test("an equivalent rewritten job reuses the cached materialization") {
    val (cache, rule) = setup
    val rng = new Random(3)
    // Job 1: run and materialize.
    val q1 = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
    val df1 = spark.sql(Sql.render(q1))
    val expected = canonRows(df1)
    cache.materialize(q1, df1)
    assert(cache.size >= 1)

    // Job 2: a heavy semantic rewrite of job 1.
    val q2 = Rewrites.heavyVariant(q1, rng)
    assert(Sql.render(q2) != Sql.render(q1), "variant should differ syntactically")
    val hitsBefore = rule.hits
    val df2 = spark.sql(Sql.render(q2))
    val actual = canonRows(df2)

    assert(rule.hits > hitsBefore, "reuse rule did not fire")
    assert(df2.queryExecution.optimizedPlan.collectFirst { case l: LocalRelation => l }.isDefined,
      s"optimized plan has no cached relation:\n${df2.queryExecution.optimizedPlan}")
    assert(actual == expected, "reused result differs from original computation")
  }

  test("a non-equivalent job is left untouched") {
    val (cache, _) = setup
    val rng = new Random(5)
    val q1 = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
    val df1 = spark.sql(Sql.render(q1))
    cache.materialize(q1, df1)

    // A different query over the same tables: must NOT be substituted.
    var q3 = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
    while (av.equivalent(q1, q3))
      q3 = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
    val noRule = canonRows(spark.sql(Sql.render(q3))
      .queryExecution.sparkSession.sql(Sql.render(q3)))
    val withRule = canonRows(spark.sql(Sql.render(q3)))
    assert(withRule == noRule)
  }

  test("reused results match a from-scratch computation across several rewrites") {
    val (cache, rule) = setup
    val rng = new Random(11)
    var tested = 0
    var seed = 100
    while (tested < 5 && seed < 160) {
      val r = new Random(seed)
      val base = QueryGen.assemble(QueryGen.baseSpec(schema, r), r)
      val df = spark.sql(Sql.render(base))
      cache.materialize(base, df)
      val expected = canonRows(df)
      val variant = Rewrites.variant(base, r, heavy = seed % 2 == 0)
      val got = canonRows(spark.sql(Sql.render(variant)))
      assert(got == expected, s"seed=$seed")
      tested += 1
      seed += 1
    }
    assert(tested == 5 && rule.hits >= 5)
  }

  test("cache.find applies SF pruning before verification") {
    val (cache, _) = setup
    val rng = new Random(21)
    val q = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
    val verifier = new Verifier()
    val before = verifier.calls
    // A candidate over disjoint tables: SF prunes, AV never invoked for it.
    val disjointTable = schema.tables.find(t => !q.atoms.map(_.table).contains(t.name))
    disjointTable.foreach { t =>
      import repro.core.ir.Ir._
      val cand = Project(Seq(ColRef("z0", t.columnNames.head)),
        Scan(t.name, "z0", t.columnNames))
      cache.find(cand, verifier)
      // Calls may be >0 for same-SF entries, but the disjoint candidate can
      // only be verified against SF-compatible entries.
      assert(verifier.calls - before <= cache.size)
    }
  }
}
