package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ClassicModelsSpec extends AnyFunSuite {

  private def blobs(n: Int, dim: Int, seed: Long): (IndexedSeq[Array[Double]], IndexedSeq[Boolean]) = {
    val rng = new Random(seed)
    val xs = IndexedSeq.tabulate(n) { i =>
      val pos = i % 2 == 0
      Array.fill(dim)((if (pos) 1.5 else -1.5) + rng.nextGaussian())
    }
    (xs, IndexedSeq.tabulate(n)(_ % 2 == 0))
  }

  /** XOR-of-signs data: linearly inseparable, tree-separable. */
  private def xorData(n: Int, seed: Long): (IndexedSeq[Array[Double]], IndexedSeq[Boolean]) = {
    val rng = new Random(seed)
    val xs = IndexedSeq.fill(n)(Array(rng.nextDouble() * 4 - 2, rng.nextDouble() * 4 - 2))
    (xs, xs.map(x => (x(0) > 0) != (x(1) > 0)))
  }

  test("LogisticRegression separates Gaussian blobs") {
    val (xs, ys) = blobs(400, 6, 1)
    val lr = new LogisticRegression(6, seed = 1)
    lr.fit(xs, ys, epochs = 20)
    val acc = xs.zip(ys).count { case (x, y) => lr.predict(x) == y }.toDouble / xs.size
    assert(acc > 0.95, s"acc=$acc")
  }

  test("LogisticRegression fails on XOR (linear limitation)") {
    val (xs, ys) = xorData(400, 2)
    val lr = new LogisticRegression(2, seed = 2)
    lr.fit(xs, ys, epochs = 30)
    val acc = xs.zip(ys).count { case (x, y) => lr.predict(x) == y }.toDouble / xs.size
    assert(acc < 0.75, s"LR unexpectedly solved XOR: acc=$acc")
  }

  test("RandomForest separates Gaussian blobs") {
    val (xs, ys) = blobs(400, 6, 3)
    val rf = new RandomForest(nTrees = 30, seed = 3)
    rf.fit(xs, ys)
    val acc = xs.zip(ys).count { case (x, y) => rf.predict(x) == y }.toDouble / xs.size
    assert(acc > 0.95, s"acc=$acc")
  }

  test("RandomForest solves XOR (nonlinear)") {
    val (xs, ys) = xorData(600, 4)
    val rf = new RandomForest(nTrees = 40, maxDepth = 10, seed = 4)
    rf.fit(xs, ys)
    val (tx, ty) = xorData(200, 5)
    val acc = tx.zip(ty).count { case (x, y) => rf.predict(x) == y }.toDouble / tx.size
    assert(acc > 0.85, s"acc=$acc")
  }

  test("RandomForest probability estimates are in [0,1]") {
    val (xs, ys) = blobs(100, 3, 6)
    val rf = new RandomForest(nTrees = 10, seed = 6)
    rf.fit(xs, ys)
    xs.foreach { x =>
      val p = rf.predictProb(x)
      assert(p >= 0.0 && p <= 1.0)
    }
  }

  test("RandomForest refuses to predict before fit") {
    assertThrows[IllegalArgumentException](new RandomForest().predictProb(Array(1.0)))
  }

  test("Confusion counts and derived metrics") {
    val pred = Seq(true, true, false, false, true)
    val act  = Seq(true, false, false, true, true)
    val c = Confusion.of(pred, act)
    assert(c == Confusion(tp = 2, fp = 1, tn = 1, fn = 1))
    assert(math.abs(c.accuracy - 0.6) < 1e-12)
    assert(math.abs(c.precision - 2.0 / 3) < 1e-12)
    assert(math.abs(c.recall - 2.0 / 3) < 1e-12)
    assert(math.abs(c.f1 - 2.0 / 3) < 1e-12)
    assert(math.abs(c.tnr - 0.5) < 1e-12)
  }

  test("Confusion edge cases: empty and degenerate classes") {
    assert(Confusion.empty.accuracy == 0.0)
    val allNeg = Confusion.of(Seq(false, false), Seq(false, false))
    assert(allNeg.tnr == 1.0 && allNeg.precision == 0.0 && allNeg.f1 == 0.0)
    val c = Confusion(1, 0, 0, 0) + Confusion(0, 0, 1, 0)
    assert(c.accuracy == 1.0)
  }
}
