package repro

import org.apache.spark.sql.functions._

class OracleSpec extends SparkSpec {
  import spark.implicits._

  private def df = Seq((1, 2.0), (3, 4.0), (5, 6.0)).toDF("k", "v")

  test("passes when Spark and DuckDB agree") {
    df.createOrReplaceTempView("t")
    val q = "SELECT CAST(k AS DOUBLE) AS c0, CAST(v AS DOUBLE) AS c1 FROM t WHERE CAST(k AS DOUBLE) > 2"
    Oracle.assertEquivalent(spark.sql(q), q, "t" -> df)
  }

  test("fails on a result mismatch") {
    df.createOrReplaceTempView("t")
    val sparkSide = spark.sql(
      "SELECT CAST(k AS DOUBLE) AS c0 FROM t WHERE CAST(k AS DOUBLE) > 2")
    val duckSql = "SELECT CAST(k AS DOUBLE) AS c0 FROM t WHERE CAST(k AS DOUBLE) > 4"
    assertThrows[IllegalArgumentException](
      Oracle.assertEquivalent(sparkSide, duckSql, "t" -> df))
  }

  test("fails on a column-name mismatch") {
    df.createOrReplaceTempView("t")
    val sparkSide = spark.sql("SELECT CAST(k AS DOUBLE) AS wrong FROM t")
    val duckSql = "SELECT CAST(k AS DOUBLE) AS c0 FROM t"
    assertThrows[IllegalArgumentException](
      Oracle.assertEquivalent(sparkSide, duckSql, "t" -> df))
  }

  test("numeric canonicalization tolerates representation differences") {
    val d = Seq(1.0, 2.5).toDF("v").select(col("v").cast("double"))
    d.createOrReplaceTempView("t2")
    val q = "SELECT CAST(v AS DOUBLE) AS c0 FROM t2"
    Oracle.assertEquivalent(spark.sql(q), q, "t2" -> d)
  }
}
