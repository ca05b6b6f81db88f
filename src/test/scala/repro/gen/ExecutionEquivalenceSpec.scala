package repro.gen

import org.apache.spark.sql.{DataFrame, Row}
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.ir.{Canon, Catalogs, Sql}
import repro.core.ir.Ir._
import repro.verifier.Verifier
import scala.util.Random

/** The end-to-end semantic guarantee: whenever the verifier says two
  * generated subexpressions are equivalent, executing both on real data
  * must produce identical results — on Spark, and (sampled) on DuckDB via
  * the Oracle. This closes the loop between the symbolic verifier and
  * actual engine semantics.
  */
class ExecutionEquivalenceSpec extends SparkSpec {

  private val av = new Verifier()

  private lazy val tpch: Map[String, DataFrame] =
    SynthData.tablesFor(spark, "tpch", sf = 0.002).map { case (k, v) => k -> v.cache() }
  private lazy val tpcds: Map[String, DataFrame] =
    SynthData.tablesFor(spark, "tpcds", sf = 0.002).map { case (k, v) => k -> v.cache() }

  private def register(tables: Map[String, DataFrame]): Unit =
    tables.foreach { case (n, df) => df.createOrReplaceTempView(n) }

  /** Atoms all connected through two-column conjuncts? (avoids accidental
    * cartesian blow-ups in the executed cross-product form).
    */
  private def connected(p: Plan): Boolean = {
    val flat = Canon.flatten(p)
    if (flat.atoms.size <= 1) return true
    val aliases = flat.atoms.map(_.alias)
    val parent = scala.collection.mutable.Map(aliases.map(a => a -> a): _*)
    def find(a: String): String = if (parent(a) == a) a else { val r = find(parent(a)); parent(a) = r; r }
    flat.conjuncts.foreach { np =>
      val ts = np.cols.map(_.table).toSeq
      if (ts.size == 2) parent(find(ts(0))) = find(ts(1))
    }
    aliases.map(find).distinct.size == 1
  }

  private def canonRows(df: DataFrame): Seq[String] =
    df.collect().toSeq.map { r: Row =>
      (0 until r.size).map(i => Option(r.get(i)).map {
        case d: Double => f"$d%.6f"
        case x         => x.toString
      }.getOrElse("null")).mkString("|")
    }.sorted

  test("verifier-equivalent TPC-H pairs return identical results on Spark (20 pairs)") {
    register(tpch)
    var tested = 0
    var seed = 0
    while (tested < 20 && seed < 200) {
      val rng = new Random(seed)
      val base = QueryGen.assemble(QueryGen.baseSpec(Catalogs.tpchLite, rng), rng)
      val variant = Rewrites.variant(base, rng, heavy = seed % 2 == 0)
      if (connected(base) && connected(variant)) {
        assert(av.equivalent(base, variant), s"seed=$seed")
        val r1 = canonRows(spark.sql(Sql.render(base)))
        val r2 = canonRows(spark.sql(Sql.render(variant)))
        assert(r1 == r2, s"seed=$seed:\n${Sql.render(base)}\nvs\n${Sql.render(variant)}")
        tested += 1
      }
      seed += 1
    }
    assert(tested == 20)
  }

  test("verifier-equivalent TPC-DS pairs return identical results on Spark (12 pairs)") {
    register(tpcds)
    var tested = 0
    var seed = 1000
    while (tested < 12 && seed < 1200) {
      val rng = new Random(seed)
      val base = QueryGen.assemble(QueryGen.baseSpec(Catalogs.tpcdsLite, rng), rng)
      val variant = Rewrites.heavyVariant(base, rng)
      if (connected(base) && connected(variant)) {
        val r1 = canonRows(spark.sql(Sql.render(base)))
        val r2 = canonRows(spark.sql(Sql.render(variant)))
        assert(r1 == r2, s"seed=$seed")
        tested += 1
      }
      seed += 1
    }
    assert(tested == 12)
  }

  test("sampled pairs also agree with the DuckDB oracle") {
    register(tpch)
    var done = 0
    var seed = 40
    while (done < 3 && seed < 100) {
      val rng = new Random(seed)
      val base = QueryGen.assemble(QueryGen.baseSpec(Catalogs.tpchLite, rng), rng)
      val variant = Rewrites.heavyVariant(base, rng)
      if (connected(base) && connected(variant) && base.atoms.size <= 2) {
        val usedTables = base.atoms.map(_.table).distinct
        val inputs = usedTables.map(t => t -> tpch(t))
        Oracle.assertEquivalent(spark.sql(Sql.render(base)), Sql.render(base), inputs: _*)
        // The variant's SQL must reproduce the base's Spark result on DuckDB.
        Oracle.assertEquivalent(spark.sql(Sql.render(base)), Sql.render(variant), inputs: _*)
        done += 1
      }
      seed += 1
    }
    assert(done == 3)
  }

  test("verifier-inequivalent pairs usually differ on data (sanity direction)") {
    register(tpch)
    var differ = 0
    var total = 0
    var seed = 300
    while (total < 10 && seed < 500) {
      val rng = new Random(seed)
      val walk = QueryGen.tableWalk(Catalogs.tpchLite, rng, 1)
      val a = QueryGen.assemble(QueryGen.specOver(Catalogs.tpchLite, walk, 2, rng), rng)
      val b = QueryGen.assemble(QueryGen.specOver(Catalogs.tpchLite, walk, 2, rng), rng)
      if (!av.equivalent(a, b) && a.output.size == b.output.size) {
        val r1 = canonRows(spark.sql(Sql.render(a)))
        val r2 = canonRows(spark.sql(Sql.render(b)))
        if (r1 != r2) differ += 1
        total += 1
      }
      seed += 1
    }
    assert(differ >= total / 2, s"only $differ/$total inequivalent pairs differed on data")
  }
}
