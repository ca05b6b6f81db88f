package repro

import org.apache.spark.sql.functions._

class SynthDataSpec extends SparkSpec {

  test("tpch tables exist with expected columns") {
    val t = SynthData.tablesFor(spark, "tpch", 0.002)
    assert(t.keySet == Set("lineitem", "orders", "customer", "part"))
    assert(t("lineitem").columns.contains("l_orderkey"))
    assert(t("orders").columns.toSeq ==
      Seq("o_orderkey", "o_custkey", "o_orderstatus", "o_totalprice", "o_orderdate"))
  }

  test("tpcds tables exist with expected columns") {
    val t = SynthData.tablesFor(spark, "tpcds", 0.002)
    assert(t.keySet == Set("store_sales", "web_sales", "item", "store", "date_dim"))
    assert(t("store_sales").columns.toSeq == Seq(
      "ss_item_sk", "ss_store_sk", "ss_sold_date_sk", "ss_quantity",
      "ss_sales_price", "ss_net_profit"))
    assert(t("item").columns.toSeq == Seq("i_item_sk", "i_brand_id", "i_class_id", "i_current_price"))
  }

  test("row counts scale with the scale factor") {
    assert(SynthData.storeSales(spark, 0.001).count() == 2880)
    assert(SynthData.webSales(spark, 0.001).count() == 720)
    assert(SynthData.item(spark).count() == 2000)
    assert(SynthData.store(spark).count() == 50)
    assert(SynthData.dateDim(spark).count() == 1000)
  }

  test("fact foreign keys land inside dimension key domains") {
    val ss = SynthData.storeSales(spark, 0.002)
    val row = ss.agg(min("ss_item_sk"), max("ss_item_sk"),
                     min("ss_sold_date_sk"), max("ss_sold_date_sk")).head
    assert(row.getLong(0) >= 1 && row.getLong(1) <= 2000)
    assert(row.getLong(2) >= 1 && row.getLong(3) <= 1000)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.storeSales(spark, 0.001).collect().map(_.toString).sorted
    val b = SynthData.storeSales(spark, 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("joins between facts and dimensions produce rows") {
    val t = SynthData.tablesFor(spark, "tpcds", 0.002)
    t.foreach { case (n, df) => df.createOrReplaceTempView(n) }
    val joined = spark.sql(
      """SELECT COUNT(*) AS c FROM store_sales, item
        | WHERE store_sales.ss_item_sk = item.i_item_sk""".stripMargin).head.getLong(0)
    assert(joined > 0)
  }

  test("tablesFor rejects unknown schemas") {
    assertThrows[IllegalArgumentException](SynthData.tablesFor(spark, "nope"))
  }
}
