package repro.core.encode

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ir.Catalogs
import repro.core.ir.Ir._
import repro.gen.QueryGen
import scala.util.Random

class NodeVectorSpec extends AnyFunSuite {

  private val schema = Catalogs.tpchLite
  private val cfg = EncoderConfig.forSchema(schema)

  private val li = Scan("lineitem", "a0", schema.tableByName("lineitem").columnNames)
  private val od = Scan("orders", "a1", schema.tableByName("orders").columnNames)

  test("NV size follows the layout formula |T| + 3|C| + 2|O| + |J| + 2 + |C|") {
    assert(cfg.nvSize == cfg.nT + 3 * cfg.nC + 2 * cfg.nOps + cfg.nJoins + 2 + cfg.nC)
  }

  test("instance config covers the whole schema, sorted") {
    assert(cfg.nT == 4)
    assert(cfg.tables == cfg.tables.sorted)
    assert(cfg.columns == cfg.columns.sorted)
    assert(cfg.nC == schema.tables.map(_.columns.size).sum)
  }

  test("scan node sets only its table one-hot") {
    val ep = NodeVector.encodeInstance(li, cfg)
    val v = ep.nodes(0)
    assert(v(cfg.offTable + cfg.tableIdx("lineitem")) == 1.0)
    assert(v.count(_ != 0.0) == 1)
  }

  test("single-column filter fills the selection segment with folded constant") {
    val p = Filter(Pred(Add(Col(ColRef("a0", "l_quantity")), Lit(3)), Gt, Lit(8)), li)
    val v = NodeVector.encodeInstance(p, cfg).nodes(0)
    assert(v(cfg.offSelCol + cfg.columnIdx("lineitem.l_quantity")) == 1.0)
    assert(v(cfg.offSelOp + cfg.opIdx(Gt)) == 1.0)
    // Folded constant: (x + 3) > 8 ⇒ x − 5 > 0 ⇒ const −5, normalized.
    assert(math.abs(v(cfg.offSelNorm) - NodeVector.normConst(-5)) < 1e-12)
    assert(v(cfg.offSelNull) == 0.0)
    assert(v(cfg.offJoinOp + cfg.opIdx(Gt)) == 0.0, "join segment must stay zero")
  }

  test("two-column filter uses the join column slots without a join type") {
    val p = Filter(Pred(Col(ColRef("a0", "l_quantity")), Lt,
      Add(Col(ColRef("a0", "l_extendedprice")), Lit(10))), li)
    val v = NodeVector.encodeInstance(p, cfg).nodes(0)
    assert(v(cfg.offJoinCl + cfg.columnIdx("lineitem.l_quantity")) == 1.0)
    assert(v(cfg.offJoinCr + cfg.columnIdx("lineitem.l_extendedprice")) == 1.0)
    assert(v(cfg.offJoinOp + cfg.opIdx(Lt)) == 1.0)
    assert((0 until cfg.nJoins).forall(j => v(cfg.offJoinJt + j) == 0.0))
    assert(math.abs(v(cfg.offSelNorm) - NodeVector.normConst(-10)) < 1e-12)
  }

  test("join node sets both columns and the join type") {
    val j = Join(Inner, li, od,
      Pred(Col(ColRef("a0", "l_orderkey")), Eq, Col(ColRef("a1", "o_orderkey"))))
    val v = NodeVector.encodeInstance(j, cfg).nodes(0)
    assert(v(cfg.offJoinCl + cfg.columnIdx("lineitem.l_orderkey")) == 1.0)
    assert(v(cfg.offJoinCr + cfg.columnIdx("orders.o_orderkey")) == 1.0)
    assert(v(cfg.offJoinJt + cfg.joinIdx(Inner)) == 1.0)
    assert(v(cfg.offSelNull) == 1.0, "no constant in the join condition")
  }

  test("project node sets the projection multi-hot") {
    val p = Project(Seq(ColRef("a0", "l_quantity"), ColRef("a0", "l_partkey")), li)
    val v = NodeVector.encodeInstance(p, cfg).nodes(0)
    assert(v(cfg.offProj + cfg.columnIdx("lineitem.l_quantity")) == 1.0)
    assert(v(cfg.offProj + cfg.columnIdx("lineitem.l_partkey")) == 1.0)
  }

  test("BFS order and child links match the tree structure") {
    val j = Join(Inner, Filter(Pred(Col(ColRef("a0", "l_quantity")), Gt, Lit(1)), li), od,
      Pred(Col(ColRef("a0", "l_orderkey")), Eq, Col(ColRef("a1", "o_orderkey"))))
    val p = Project(Seq(ColRef("a1", "o_custkey")), j)
    val ep = NodeVector.encodeInstance(p, cfg)
    // BFS: 0=Project, 1=Join, 2=Filter, 3=orders Scan, 4=lineitem Scan.
    assert(ep.numNodes == 5)
    assert(ep.left(0) == 1 && ep.right(0) == -1)
    assert(ep.left(1) == 2 && ep.right(1) == 3)
    assert(ep.left(2) == 4 && ep.right(2) == -1)
    assert(ep.left(3) == -1 && ep.left(4) == -1)
    assert(ep.nodes(3)(cfg.offTable + cfg.tableIdx("orders")) == 1.0)
    assert(ep.nodes(4)(cfg.offTable + cfg.tableIdx("lineitem")) == 1.0)
  }

  test("normConst is bounded, monotone, and sign-preserving") {
    assert(NodeVector.normConst(0) == 0.0)
    assert(NodeVector.normConst(1e9) < 1.0 && NodeVector.normConst(1e9) > 0.99)
    assert(NodeVector.normConst(-1e9) > -1.0)
    assert(NodeVector.normConst(10) < NodeVector.normConst(20))
  }

  test("generated plans always encode without error and with finite values") {
    for (seed <- 0 until 60) {
      val rng = new Random(seed)
      val plan = QueryGen.assemble(QueryGen.baseSpec(schema, rng), rng)
      val ep = NodeVector.encodeInstance(plan, cfg)
      assert(ep.numNodes == plan.numOps)
      ep.nodes.foreach(_.foreach(x => assert(!x.isNaN && !x.isInfinite)))
    }
  }
}
