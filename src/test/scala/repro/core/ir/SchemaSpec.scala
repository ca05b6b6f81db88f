package repro.core.ir

import org.scalatest.funsuite.AnyFunSuite

class SchemaSpec extends AnyFunSuite {

  test("tpchLite declares the expected tables and join graph") {
    val s = Catalogs.tpchLite
    assert(s.tables.map(_.name).toSet == Set("lineitem", "orders", "customer", "part"))
    assert(s.joins.size == 3)
    assert(s.edgesOf("lineitem").map(_._2).toSet == Set("orders", "part"))
    assert(s.edgesOf("customer").map(_._2) == Seq("orders"))
  }

  test("tpcdsLite is a star over store_sales plus a web_sales arm") {
    val s = Catalogs.tpcdsLite
    assert(s.edgesOf("store_sales").map(_._2).toSet == Set("item", "store", "date_dim"))
    assert(s.edgesOf("item").map(_._2).toSet == Set("store_sales", "web_sales"))
  }

  test("edgesOf orients edges toward the queried table") {
    val s = Catalogs.tpchLite
    val (cMine, other, cOther) = s.edgesOf("orders").find(_._2 == "lineitem").get
    assert(cMine == "o_orderkey" && cOther == "l_orderkey")
  }

  test("column lookup succeeds for declared columns and fails otherwise") {
    val s = Catalogs.tpchLite
    assert(s.column("lineitem", "l_quantity").lo == 1)
    assertThrows[NoSuchElementException](s.column("lineitem", "nope"))
  }

  test("random schemas are deterministic in the seed") {
    assert(Catalogs.random(5) == Catalogs.random(5))
    assert(Catalogs.random(5) != Catalogs.random(6))
  }

  test("random schemas are join-connected (chain edges)") {
    for (seed <- 0 until 10) {
      val s = Catalogs.random(seed)
      val names = s.tables.map(_.name)
      // Union-find over declared edges.
      val parent = scala.collection.mutable.Map(names.map(n => n -> n): _*)
      def find(a: String): String =
        if (parent(a) == a) a else { val r = find(parent(a)); parent(a) = r; r }
      s.joins.foreach(e => parent(find(e.t1)) = find(e.t2))
      assert(names.map(find).distinct.size == 1, s"seed=$seed disconnected")
    }
  }

  test("random schema tables have unique names and valid column ranges") {
    val s = Catalogs.random(9)
    assert(s.tables.map(_.name).distinct.size == s.tables.size)
    s.tables.flatMap(_.columns).foreach(c => assert(c.hi > c.lo))
  }
}
