package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.ir.{Canon, Catalogs}
import repro.core.sf.SchemaFilter
import repro.gen.Workloads

/** Distributed schema-filter grouping (§2.2.1's scale story): subexpression
  * signatures become a DataFrame and SF-groups are computed with a groupBy —
  * the form the O(n) filter takes when the workload has cloud-scale
  * cardinality and a single driver cannot hold it.
  *
  * Usage: spark-submit --class repro.jobs.SfGroupJob repro.jar [nSubexprs]
  */
object SfGroupJob {
  def main(args: Array[String]): Unit = {
    val n = args.lift(0).map(_.toInt).getOrElse(2000)
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("geqo-sf-group").getOrCreate()
    import spark.implicits._

    val es = Workloads.evalWorkload(Catalogs.tpcdsLite, n, n / 20, seed = 1)
    val sigs = es.subexprs.zipWithIndex.map { case (p, i) =>
      val key = SchemaFilter.key(p)
      (i, key._1.mkString(","), key._2, Canon.flatten(p).conjuncts.size)
    }

    val df = sigs.toDF("id", "tables", "arity", "conjuncts")
    val groups = df.groupBy($"tables", $"arity").count()
      .orderBy($"count".desc)

    println(s"SF groups over $n subexpressions:")
    groups.show(50, truncate = false)

    val intraPairs = groups.selectExpr("sum(count * (count - 1) / 2)").head.getDouble(0)
    val totalPairs = n.toLong * (n - 1) / 2
    println(f"pairs surviving SF: ${intraPairs}%.0f of $totalPairs " +
      f"(${100.0 * intraPairs / totalPairs}%.1f%%)")
    spark.stop()
  }
}
