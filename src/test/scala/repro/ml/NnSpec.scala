package repro.ml

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Numerical gradient checks for every layer, plus learnability smoke tests
  * — the correctness foundation under the EMF (a wrong backward pass shows
  * up as silent accuracy loss, not a crash).
  */
class NnSpec extends AnyFunSuite {

  private val eps = 1e-6
  private val tol = 1e-4

  private def numericVsAnalytic(p: Param, analytic: Array[Double],
                                lossFn: () => Double, samples: Int = 20,
                                rng: Random = new Random(3)): Unit = {
    for (_ <- 0 until samples) {
      val i = rng.nextInt(p.size)
      val orig = p.v(i)
      p.v(i) = orig + eps; val up = lossFn()
      p.v(i) = orig - eps; val dn = lossFn()
      p.v(i) = orig
      val num = (up - dn) / (2 * eps)
      assert(math.abs(num - analytic(i)) < tol * math.max(1.0, math.abs(num)),
        s"param[$i]: numeric=$num analytic=${analytic(i)}")
    }
  }

  test("Dense gradient check (weights, bias, input)") {
    val rng = new Random(1)
    val layer = new Dense(7, 5, rng)
    val x = Array.fill(7)(rng.nextDouble() * 2 - 1)
    val gy = Array.fill(5)(rng.nextDouble() * 2 - 1)
    def loss(): Double = layer.forward(x).zip(gy).map { case (a, b) => a * b }.sum

    layer.params.foreach(_.zeroGrad())
    val gx = layer.backward(x, gy)
    numericVsAnalytic(layer.w, layer.w.g, loss)
    numericVsAnalytic(layer.b, layer.b.g, loss, samples = 5)
    // Input gradient via perturbation.
    for (i <- x.indices) {
      val o = x(i)
      x(i) = o + eps; val up = loss()
      x(i) = o - eps; val dn = loss()
      x(i) = o
      assert(math.abs((up - dn) / (2 * eps) - gx(i)) < tol)
    }
  }

  test("PReLU gradient check including alpha") {
    val rng = new Random(2)
    val layer = new PRelu(rng)
    val x = Array(-1.5, -0.2, 0.0, 0.3, 2.0)
    val gy = Array.fill(5)(rng.nextDouble() * 2 - 1)
    def loss(): Double = layer.forward(x).zip(gy).map { case (a, b) => a * b }.sum
    layer.alpha.zeroGrad()
    val gx = layer.backward(x, gy)
    numericVsAnalytic(layer.alpha, layer.alpha.g, loss, samples = 1)
    for (i <- x.indices if x(i) != 0.0) {
      val o = x(i)
      x(i) = o + eps; val up = loss()
      x(i) = o - eps; val dn = loss()
      x(i) = o
      assert(math.abs((up - dn) / (2 * eps) - gx(i)) < tol, s"i=$i")
    }
  }

  test("TreeConv gradient check on a 5-node tree") {
    val rng = new Random(4)
    val layer = new TreeConv(6, 4, rng)
    //      0
    //     / \
    //    1   2
    //   / \
    //  3   4
    val left  = Array(1, 3, -1, -1, -1)
    val right = Array(2, 4, -1, -1, -1)
    val nodes = Array.fill(5)(Array.fill(6)(rng.nextDouble() * 2 - 1))
    val gys   = Array.fill(5)(Array.fill(4)(rng.nextDouble() * 2 - 1))
    def loss(): Double =
      layer.forward(nodes, left, right).zip(gys)
        .map { case (y, g) => y.zip(g).map { case (a, b) => a * b }.sum }.sum

    layer.params.foreach(_.zeroGrad())
    val gxs = layer.backward(nodes, left, right, gys)
    numericVsAnalytic(layer.ws, layer.ws.g, loss)
    numericVsAnalytic(layer.wl, layer.wl.g, loss)
    numericVsAnalytic(layer.wr, layer.wr.g, loss)
    numericVsAnalytic(layer.b, layer.b.g, loss, samples = 4)
    // Input gradients (node 1 feeds itself, its parent's wl, and children slots).
    for (n <- 0 until 5; i <- 0 until 6) {
      val o = nodes(n)(i)
      nodes(n)(i) = o + eps; val up = loss()
      nodes(n)(i) = o - eps; val dn = loss()
      nodes(n)(i) = o
      assert(math.abs((up - dn) / (2 * eps) - gxs(n)(i)) < tol, s"node=$n i=$i")
    }
  }

  test("MaxPool routes gradient to the argmax") {
    val nodes = Array(Array(1.0, 5.0), Array(3.0, 2.0), Array(2.0, 4.0))
    val (y, arg) = MaxPool.forward(nodes)
    assert(y.toSeq == Seq(3.0, 5.0))
    assert(arg.toSeq == Seq(1, 0))
    val gxs = MaxPool.backward(3, arg, Array(10.0, 20.0))
    assert(gxs(1)(0) == 10.0 && gxs(0)(1) == 20.0)
    assert(gxs(2).forall(_ == 0.0))
  }

  test("Dropout scales kept units and zeroes dropped ones; identity at inference") {
    val rng = new Random(5)
    val d = new Dropout(0.5)
    val x = Array.fill(1000)(1.0)
    val (y, mask) = d.forward(x, rng, training = true)
    val kept = y.count(_ != 0.0)
    assert(kept > 350 && kept < 650)
    y.filter(_ != 0.0).foreach(v => assert(math.abs(v - 2.0) < 1e-9))
    val gx = d.backward(mask, Array.fill(1000)(1.0))
    assert(gx.toSeq == y.toSeq)
    val (yInf, maskInf) = d.forward(x, rng, training = false)
    assert(yInf.eq(x) && maskInf == null)
  }

  test("Adam decreases a quadratic loss") {
    val p = new Param(1, 4).initUniform(new Random(6), 5.0)
    val opt = new Adam(Seq(p), lr = 0.1, wd = 0.0)
    def loss(): Double = p.v.map(v => (v - 1.0) * (v - 1.0)).sum
    val before = loss()
    for (_ <- 0 until 200) {
      opt.zeroGrad()
      for (i <- 0 until 4) p.g(i) = 2 * (p.v(i) - 1.0)
      opt.step(1)
    }
    assert(loss() < before * 0.01, s"${loss()} vs $before")
  }

  test("sigmoid and BCE basics") {
    assert(math.abs(NnOps.sigmoid(0.0) - 0.5) < 1e-12)
    val (l1, d1) = NnOps.bceWithLogit(10.0, 1.0)
    assert(l1 < 0.01 && math.abs(d1) < 0.01)
    val (l0, d0) = NnOps.bceWithLogit(10.0, 0.0)
    assert(l0 > 5 && d0 > 0.9)
  }

  test("a Dense+PReLU network learns XOR") {
    val rng = new Random(7)
    val h = new Dense(2, 8, rng)
    val a = new PRelu(rng)
    val o = new Dense(8, 1, rng)
    val opt = new Adam(h.params ++ a.params ++ o.params, lr = 0.01, wd = 0.0)
    val data = Seq((Array(0.0, 0.0), 0.0), (Array(0.0, 1.0), 1.0),
                   (Array(1.0, 0.0), 1.0), (Array(1.0, 1.0), 0.0))
    for (_ <- 0 until 2000) {
      opt.zeroGrad()
      data.foreach { case (x, label) =>
        val z1 = h.forward(x); val a1 = a.forward(z1)
        val logit = o.forward(a1)(0)
        val (_, d) = NnOps.bceWithLogit(logit, label)
        val gA1 = o.backward(a1, Array(d))
        val gZ1 = a.backward(z1, gA1)
        h.backward(x, gZ1)
      }
      opt.step(data.size)
    }
    data.foreach { case (x, label) =>
      val p = NnOps.sigmoid(o.forward(a.forward(h.forward(x)))(0))
      assert(math.abs(p - label) < 0.2, s"x=${x.toSeq} p=$p want $label")
    }
  }
}
