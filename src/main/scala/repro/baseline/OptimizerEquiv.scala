package repro.baseline

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.catalyst.plans.logical.LogicalPlan
import repro.core.ir.Ir.Plan
import repro.core.ir.{Schema, Sql}
import scala.collection.mutable

/** Optimizer-based equivalence detection (the Calcite baseline of §7.5,
  * here standing on Spark's Catalyst): two subexpressions are judged
  * equivalent when their *optimized* logical plans are `sameResult` — i.e.
  * Catalyst's rule set normalizes away their differences. Detects
  * rule-reachable rewrites (predicate placement/order, alias choice) but
  * misses semantic equivalences outside the rule set, exactly the gap GEqO
  * closes.
  *
  * Requires the schema's tables to exist as (possibly empty) temp views;
  * [[OptimizerEquiv.registerEmptyTables]] sets them up.
  */
final class OptimizerEquiv(spark: SparkSession) {

  private val cache = mutable.HashMap.empty[Plan, LogicalPlan]

  /** Optimized Catalyst plan of the rendered SQL (memoized: one optimizer
    * invocation per distinct subexpression).
    */
  def optimized(p: Plan): LogicalPlan =
    cache.getOrElseUpdate(p, spark.sql(Sql.render(p)).queryExecution.optimizedPlan)

  def equivalent(p: Plan, q: Plan): Boolean = optimized(p).sameResult(optimized(q))
}

object OptimizerEquiv {
  /** Register every schema table as a tiny Range-backed temp view so plans
    * analyze. Range leaves (unlike empty LocalRelations) are neither
    * empty-propagated nor constant-folded away, so the optimizer compares
    * *plans*, not evaluated data — the honest Calcite-baseline behaviour.
    */
  def registerEmptyTables(spark: SparkSession, schema: Schema): Unit = {
    import org.apache.spark.sql.functions._
    schema.tables.foreach { t =>
      val cols = t.columnNames.zipWithIndex.map { case (c, i) =>
        (col("id") * (i + 1)).cast("double").as(c)
      }
      spark.range(2).select(cols: _*).createOrReplaceTempView(t.name)
    }
  }
}
