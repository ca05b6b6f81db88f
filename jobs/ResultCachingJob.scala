package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.SynthData
import repro.core.ir.{Catalogs, Sql}
import repro.gen.{QueryGen, Rewrites, Workloads}
import repro.sparkreuse.{ReuseCache, ReuseRule}
import repro.verifier.Verifier
import scala.util.Random

/** The §7.7 result-caching case study on Spark: run a workload with
  * rewrite-duplicated queries twice — cold, then with the GEqO-backed reuse
  * rule substituting semantically-equivalent subexpressions from the cache —
  * and report the computation reduction and cache hit count.
  *
  * Usage: spark-submit --class repro.jobs.ResultCachingJob repro.jar [nQueries] [sf]
  */
object ResultCachingJob {
  def main(args: Array[String]): Unit = {
    val nQueries = args.lift(0).map(_.toInt).getOrElse(30)
    val sf = args.lift(1).map(_.toDouble).getOrElse(0.01)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("geqo-result-caching").getOrCreate()

    SynthData.tablesFor(spark, "tpch", sf)
      .foreach { case (n, df) => df.cache().createOrReplaceTempView(n) }

    // Workload: base queries plus semantic-rewrite duplicates (the paper's
    // 5,277-equivalence-class TPC-DS workload, scaled down).
    val rng = new Random(3)
    val bases = Vector.fill(nQueries / 2)(
      QueryGen.assemble(QueryGen.baseSpec(Catalogs.tpchLite, rng), rng))
    val workload = rng.shuffle(bases ++ bases.map(b => Rewrites.variant(b, rng, heavy = rng.nextBoolean())))

    def runAll(): Double = {
      val t0 = System.nanoTime()
      workload.foreach(q => spark.sql(Sql.render(q)).collect())
      (System.nanoTime() - t0) / 1e9
    }

    val cold = runAll()

    // Warm: materialize first occurrence of each equivalence class, reuse after.
    val cache = new ReuseCache
    val rule = new ReuseRule(cache,
      ReuseRule.bodyResolver(spark, Catalogs.tpchLite.tables.map(_.name)), new Verifier())
    ReuseRule.install(spark, rule)
    val av = new Verifier()
    val t0 = System.nanoTime()
    workload.foreach { q =>
      val df = spark.sql(Sql.render(q))
      df.collect()
      if (cache.find(q, av).isEmpty) cache.materialize(q, df)
    }
    val warm = (System.nanoTime() - t0) / 1e9

    println(f"queries: ${workload.size}, equivalence classes: ${Workloads.groundTruth(workload).size} pairs")
    println(f"cold run: $cold%.1f s; with GEqO reuse: $warm%.1f s; reuse hits: ${rule.hits}")
    println(f"computation reduction: ${100 * (1 - warm / cold)}%.1f%%")
    spark.stop()
  }
}
