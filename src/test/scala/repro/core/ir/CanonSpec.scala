package repro.core.ir

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ir.Canon._
import repro.core.ir.Ir._
import scala.util.Random

class CanonSpec extends AnyFunSuite {

  private val x = ColRef("a0", "x")
  private val y = ColRef("a1", "y")

  test("lin folds constants") {
    assert(lin(Add(Lit(3), Lit(4))) == Lin(Map.empty, 7.0))
    assert(lin(Sub(Add(Col(x), Lit(10)), Lit(4))) == Lin(Map(x -> 1.0), 6.0))
  }

  test("lin cancels columns") {
    assert(lin(Sub(Col(x), Col(x))) == Lin(Map.empty, 0.0))
  }

  test("normalize: x < 5 gives x - 5 < 0") {
    val np = normalize(Pred(Col(x), Lt, Lit(5)))
    assert(np == NormPred(List(x -> 1.0), -5.0, NLt))
  }

  test("normalize: flipping operand sides preserves normal form") {
    for (op <- AllOps) {
      val p = Pred(Col(x), op, Add(Col(y), Lit(10)))
      assert(normalize(p) == normalize(p.flip), s"op $op")
    }
  }

  test("normalize: constant shifting preserves normal form") {
    val p1 = Pred(Col(x), Gt, Lit(10))
    val p2 = Pred(Add(Col(x), Lit(7)), Gt, Lit(17))
    assert(normalize(p1) == normalize(p2))
  }

  test("normalize: Figure-1 style — b + 10 > 20 equals b > 10") {
    val b = ColRef("a1", "val")
    val p1 = Pred(Add(Col(b), Lit(10)), Gt, Lit(20))
    val p2 = Pred(Col(b), Gt, Lit(10))
    assert(normalize(p1) == normalize(p2))
  }

  test("normalize: equality canonical sign") {
    val p1 = Pred(Col(x), Eq, Col(y))
    val p2 = Pred(Col(y), Eq, Col(x))
    assert(normalize(p1) == normalize(p2))
  }

  test("normalize: Gt/Lt are mirror forms") {
    assert(normalize(Pred(Col(x), Gt, Col(y))) == normalize(Pred(Col(y), Lt, Col(x))))
  }

  test("isDifferenceForm accepts the generated class") {
    assert(normalize(Pred(Col(x), Lt, Lit(3))).isDifferenceForm)
    assert(normalize(Pred(Col(x), Ge, Add(Col(y), Lit(3)))).isDifferenceForm)
    assert(normalize(Pred(Lit(0), Le, Lit(0))).isDifferenceForm)
  }

  test("isDifferenceForm rejects same-sign two-column sums") {
    val np = toNorm(Lin(Map(x -> 1.0, y -> 1.0), -3.0), NLt)
    assert(!np.isDifferenceForm)
  }

  test("renderPred round-trips through normalize (500 random cases)") {
    val rng = new Random(0)
    for (i <- 0 until 500) {
      val np =
        if (i % 3 == 0) normalize(Pred(Col(x), AllOps(rng.nextInt(5)), Lit(rng.nextInt(100) - 50)))
        else if (i % 3 == 1)
          normalize(Pred(Col(x), AllOps(rng.nextInt(5)), Add(Col(y), Lit(rng.nextInt(40) - 20))))
        else normalize(Pred(Lit(rng.nextInt(100) - 50), AllOps(rng.nextInt(5)), Col(y)))
      val rendered = Canon.renderPred(np, rng)
      assert(normalize(rendered) == np, s"case $i: $np vs $rendered")
    }
  }

  test("flatten collects atoms, conjuncts and projection") {
    val li = Scan("lineitem", "a0", Seq("l_orderkey", "l_quantity"))
    val od = Scan("orders", "a1", Seq("o_orderkey"))
    val p = Project(Seq(ColRef("a0", "l_quantity")),
      Filter(Pred(Col(ColRef("a0", "l_quantity")), Gt, Lit(5)),
        Join(Inner, li, od,
          Pred(Col(ColRef("a0", "l_orderkey")), Eq, Col(ColRef("a1", "o_orderkey"))))))
    val f = Canon.flatten(p)
    assert(f.atoms.map(_.table) == Seq("lineitem", "orders"))
    assert(f.conjuncts.size == 2)
    assert(f.proj == Seq(ColRef("a0", "l_quantity")))
    assert(f.tableMultiset == Seq("lineitem", "orders"))
  }

  test("flatten rejects non-root Project") {
    val li = Scan("lineitem", "a0", Seq("l_orderkey"))
    val bad = Filter(Pred(Col(ColRef("a0", "l_orderkey")), Gt, Lit(0)),
      Project(Seq(ColRef("a0", "l_orderkey")), li))
    assertThrows[IllegalArgumentException](Canon.flatten(bad))
  }

  test("plan output order: join concatenates left then right") {
    val a = Scan("t", "a0", Seq("c1", "c2"))
    val b = Scan("u", "a1", Seq("d1"))
    val j = Join(Inner, a, b, Pred(Col(ColRef("a0", "c1")), Eq, Col(ColRef("a1", "d1"))))
    assert(j.output == Seq(ColRef("a0", "c1"), ColRef("a0", "c2"), ColRef("a1", "d1")))
  }

  test("subexpressions enumerate every subtree including the root") {
    val a = Scan("t", "a0", Seq("c1"))
    val f = Filter(Pred(Col(ColRef("a0", "c1")), Gt, Lit(1)), a)
    val p = Project(Seq(ColRef("a0", "c1")), f)
    assert(p.subexpressions.toSet == Set(p, f, a))
    assert(p.numOps == 3)
  }

  test("rename substitutes atom aliases in normalized predicates") {
    val np = normalize(Pred(Col(x), Lt, Add(Col(y), Lit(2))))
    val renamed = Canon.rename(np, Map("a0" -> "b0", "a1" -> "b1"))
    assert(renamed.cols == Set(ColRef("b0", "x"), ColRef("b1", "y")))
    assert(renamed.const == np.const && renamed.op == np.op)
  }
}
