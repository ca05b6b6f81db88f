package repro.core.ir

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.ir.Ir._

class SqlSpec extends SparkSpec {

  private lazy val tables: Map[String, DataFrame] =
    SynthData.tablesFor(spark, "tpch", sf = 0.002).map { case (k, v) => k -> v.cache() }

  private def registerAll(): Unit =
    tables.foreach { case (n, df) => df.createOrReplaceTempView(n) }

  private val liCols = Catalogs.tpchLite.tableByName("lineitem").columnNames
  private val odCols = Catalogs.tpchLite.tableByName("orders").columnNames

  test("render a single-table filter query and cross-check with DuckDB") {
    registerAll()
    val p = Project(Seq(ColRef("a0", "l_quantity"), ColRef("a0", "l_orderkey")),
      Filter(Pred(Col(ColRef("a0", "l_quantity")), Gt, Lit(45)),
        Scan("lineitem", "a0", liCols)))
    val sql = Sql.render(p)
    assert(sql.startsWith("SELECT"))
    val df = spark.sql(sql)
    assert(df.columns.toSeq == Seq("c0", "c1"))
    Oracle.assertEquivalent(df, sql, "lineitem" -> tables("lineitem"))
  }

  test("render a join query and cross-check with DuckDB") {
    registerAll()
    val p = Project(Seq(ColRef("a0", "l_extendedprice"), ColRef("a1", "o_totalprice")),
      Filter(Pred(Col(ColRef("a1", "o_totalprice")), Lt, Lit(50000)),
        Join(Inner,
          Scan("lineitem", "a0", liCols),
          Scan("orders", "a1", odCols),
          Pred(Col(ColRef("a0", "l_orderkey")), Eq, Col(ColRef("a1", "o_orderkey"))))))
    val sql = Sql.render(p)
    val df = spark.sql(sql)
    Oracle.assertEquivalent(df, sql,
      "lineitem" -> tables("lineitem"), "orders" -> tables("orders"))
  }

  test("two-column difference predicates render and execute") {
    registerAll()
    val p = Project(Seq(ColRef("a0", "l_quantity")),
      Filter(Pred(Col(ColRef("a0", "l_quantity")), Gt,
        Add(Col(ColRef("a0", "l_tax")), Lit(40))),
        Scan("lineitem", "a0", liCols ++ Seq("l_tax"))))
    val df = spark.sql(Sql.render(p))
    assert(df.count() > 0)
  }

  test("literal rendering drops trailing .0 on whole numbers") {
    assert(Sql.scalar(Lit(10.0)) == "10")
    assert(Sql.scalar(Lit(10.5)) == "10.5")
    assert(Sql.scalar(Lit(-3.0)) == "-3")
  }

  test("predicate rendering wraps columns in CAST") {
    val s = Sql.pred(Pred(Col(ColRef("a0", "x")), Le, Add(Col(ColRef("a1", "y")), Lit(2))))
    assert(s == "CAST(a0.x AS DOUBLE) <= (CAST(a1.y AS DOUBLE) + 2)")
  }

  test("collectPreds returns filters and join conditions in tree order") {
    val li = Scan("lineitem", "a0", liCols)
    val od = Scan("orders", "a1", odCols)
    val f1 = Pred(Col(ColRef("a0", "l_quantity")), Gt, Lit(1))
    val jc = Pred(Col(ColRef("a0", "l_orderkey")), Eq, Col(ColRef("a1", "o_orderkey")))
    val f2 = Pred(Col(ColRef("a1", "o_totalprice")), Lt, Lit(9))
    val p = Project(Seq(ColRef("a0", "l_quantity")),
      Filter(f2, Join(Inner, Filter(f1, li), od, jc)))
    assert(Sql.collectPreds(p) == Seq(f1, jc, f2))
  }

  test("rendered SQL for a filterless scan has no WHERE clause") {
    val p = Project(Seq(ColRef("a0", "l_quantity")), Scan("lineitem", "a0", liCols))
    assert(!Sql.render(p).contains("WHERE"))
  }
}
