package repro.ml

import scala.util.Random

/** Minimal neural-network substrate (the PyTorch substitute): parameters
  * with explicit gradients, Adam with decoupled weight decay, and the layer
  * set the EMF architecture needs — Dense, PReLU, Dropout, TreeConv, and
  * dynamic max pooling (§5). All layers are per-sample with gradient
  * accumulation across a minibatch; arrays are raw `Array[Double]` with
  * hand-written while-loops for JIT-friendly inner products.
  */
final class Param(val rows: Int, val cols: Int) {
  val size: Int = rows * cols
  val v: Array[Double]  = new Array(size) // value
  val g: Array[Double]  = new Array(size) // accumulated gradient
  val m1: Array[Double] = new Array(size) // Adam first moment
  val m2: Array[Double] = new Array(size) // Adam second moment

  def initUniform(rng: Random, scale: Double): this.type = {
    var i = 0
    while (i < size) { v(i) = (rng.nextDouble() * 2 - 1) * scale; i += 1 }
    this
  }
  def fill(x: Double): this.type = { java.util.Arrays.fill(v, x); this }
  def zeroGrad(): Unit = java.util.Arrays.fill(g, 0.0)
}

/** Adam (Kingma & Ba) with decoupled weight decay — the paper's optimizer
  * settings are lr 1e-3, weight decay 5e-4 (§7 "Implementation").
  */
final class Adam(params: Seq[Param], lr: Double = 1e-3, wd: Double = 5e-4,
                 b1: Double = 0.9, b2: Double = 0.999, eps: Double = 1e-8) {
  private var t = 0

  def zeroGrad(): Unit = params.foreach(_.zeroGrad())

  /** One update step; `batch` scales accumulated gradients to a mean. */
  def step(batch: Int): Unit = {
    t += 1
    val c1 = 1 - math.pow(b1, t)
    val c2 = 1 - math.pow(b2, t)
    params.foreach { p =>
      var i = 0
      while (i < p.size) {
        val g = p.g(i) / batch + wd * p.v(i)
        p.m1(i) = b1 * p.m1(i) + (1 - b1) * g
        p.m2(i) = b2 * p.m2(i) + (1 - b2) * g * g
        p.v(i) -= lr * (p.m1(i) / c1) / (math.sqrt(p.m2(i) / c2) + eps)
        i += 1
      }
    }
  }
}

/** Fully connected layer y = W·x + b. */
final class Dense(val in: Int, val out: Int, rng: Random) {
  val w: Param = new Param(out, in).initUniform(rng, math.sqrt(6.0 / (in + out)))
  val b: Param = new Param(out, 1)
  def params: Seq[Param] = Seq(w, b)

  def forward(x: Array[Double]): Array[Double] = {
    val y = new Array[Double](out)
    var o = 0
    while (o < out) {
      var s = b.v(o); val base = o * in
      var i = 0
      while (i < in) { s += w.v(base + i) * x(i); i += 1 }
      y(o) = s; o += 1
    }
    y
  }

  /** Accumulates dW, db; returns dx. */
  def backward(x: Array[Double], gy: Array[Double]): Array[Double] = {
    val gx = new Array[Double](in)
    var o = 0
    while (o < out) {
      val go = gy(o); val base = o * in
      b.g(o) += go
      var i = 0
      while (i < in) {
        w.g(base + i) += go * x(i)
        gx(i) += w.v(base + i) * go
        i += 1
      }
      o += 1
    }
    gx
  }
}

/** Parametric ReLU with a learnable per-layer slope (§5: PReLU activation). */
final class PRelu(rng: Random) {
  val alpha: Param = new Param(1, 1).fill(0.25)
  def params: Seq[Param] = Seq(alpha)

  def forward(x: Array[Double]): Array[Double] = {
    val a = alpha.v(0)
    val y = new Array[Double](x.length)
    var i = 0
    while (i < x.length) { y(i) = if (x(i) >= 0) x(i) else a * x(i); i += 1 }
    y
  }

  def backward(x: Array[Double], gy: Array[Double]): Array[Double] = {
    val a = alpha.v(0)
    val gx = new Array[Double](x.length)
    var i = 0
    while (i < x.length) {
      if (x(i) >= 0) gx(i) = gy(i)
      else { gx(i) = a * gy(i); alpha.g(0) += x(i) * gy(i) }
      i += 1
    }
    gx
  }
}

/** Inverted dropout; identity at inference. */
final class Dropout(p: Double) {
  def forward(x: Array[Double], rng: Random, training: Boolean): (Array[Double], Array[Double]) = {
    if (!training || p <= 0) (x, null)
    else {
      val keep = 1 - p
      val mask = new Array[Double](x.length)
      val y    = new Array[Double](x.length)
      var i = 0
      while (i < x.length) {
        mask(i) = if (rng.nextDouble() < keep) 1.0 / keep else 0.0
        y(i) = x(i) * mask(i); i += 1
      }
      (y, mask)
    }
  }
  def backward(mask: Array[Double], gy: Array[Double]): Array[Double] = {
    if (mask == null) gy
    else {
      val gx = new Array[Double](gy.length)
      var i = 0
      while (i < gy.length) { gx(i) = gy(i) * mask(i); i += 1 }
      gx
    }
  }
}

/** Tree convolution (Mou et al. [39], as used by Neo [37] and the EMF §5):
  * each node's output is a learned map of [node, left-child, right-child]
  * with absent children as zero vectors. Weight sharing across nodes.
  */
final class TreeConv(val in: Int, val out: Int, rng: Random) {
  private val scale = math.sqrt(6.0 / (3 * in + out))
  val ws: Param = new Param(out, in).initUniform(rng, scale)
  val wl: Param = new Param(out, in).initUniform(rng, scale)
  val wr: Param = new Param(out, in).initUniform(rng, scale)
  val b: Param  = new Param(out, 1)
  def params: Seq[Param] = Seq(ws, wl, wr, b)

  /** `left(i)` / `right(i)` are child node indices or -1. */
  def forward(nodes: Array[Array[Double]], left: Array[Int], right: Array[Int]): Array[Array[Double]] = {
    val n = nodes.length
    val ys = new Array[Array[Double]](n)
    var i = 0
    while (i < n) {
      val y = new Array[Double](out)
      addMatVec(ws, nodes(i), y)
      if (left(i) >= 0) addMatVec(wl, nodes(left(i)), y)
      if (right(i) >= 0) addMatVec(wr, nodes(right(i)), y)
      var o = 0
      while (o < out) { y(o) += b.v(o); o += 1 }
      ys(i) = y; i += 1
    }
    ys
  }

  def backward(nodes: Array[Array[Double]], left: Array[Int], right: Array[Int],
               gys: Array[Array[Double]]): Array[Array[Double]] = {
    val n = nodes.length
    val gxs = Array.fill(n)(new Array[Double](in))
    var i = 0
    while (i < n) {
      val gy = gys(i)
      var o = 0
      while (o < out) { b.g(o) += gy(o); o += 1 }
      backOne(ws, nodes(i), gy, gxs(i))
      if (left(i) >= 0) backOne(wl, nodes(left(i)), gy, gxs(left(i)))
      if (right(i) >= 0) backOne(wr, nodes(right(i)), gy, gxs(right(i)))
      i += 1
    }
    gxs
  }

  @inline private def addMatVec(wp: Param, x: Array[Double], y: Array[Double]): Unit = {
    var o = 0
    while (o < out) {
      var s = 0.0; val base = o * in
      var i = 0
      while (i < in) { s += wp.v(base + i) * x(i); i += 1 }
      y(o) += s; o += 1
    }
  }

  @inline private def backOne(wp: Param, x: Array[Double], gy: Array[Double],
                              gx: Array[Double]): Unit = {
    var o = 0
    while (o < out) {
      val go = gy(o); val base = o * in
      var i = 0
      while (i < in) {
        wp.g(base + i) += go * x(i)
        gx(i) += wp.v(base + i) * go
        i += 1
      }
      o += 1
    }
  }
}

/** Dynamic max pooling over nodes → a fixed-size plan summary (§3.2). */
object MaxPool {
  def forward(nodes: Array[Array[Double]]): (Array[Double], Array[Int]) = {
    val d = nodes(0).length
    val y = new Array[Double](d)
    val arg = new Array[Int](d)
    var j = 0
    while (j < d) {
      var best = nodes(0)(j); var bi = 0
      var i = 1
      while (i < nodes.length) {
        if (nodes(i)(j) > best) { best = nodes(i)(j); bi = i }
        i += 1
      }
      y(j) = best; arg(j) = bi; j += 1
    }
    (y, arg)
  }

  def backward(nNodes: Int, arg: Array[Int], gy: Array[Double]): Array[Array[Double]] = {
    val gxs = Array.fill(nNodes)(new Array[Double](gy.length))
    var j = 0
    while (j < gy.length) { gxs(arg(j))(j) += gy(j); j += 1 }
    gxs
  }
}

object NnOps {
  @inline def sigmoid(z: Double): Double = 1.0 / (1.0 + math.exp(-z))

  /** Binary cross-entropy on a logit; returns (loss, dLoss/dLogit). */
  def bceWithLogit(logit: Double, label: Double): (Double, Double) = {
    val p = sigmoid(logit)
    val eps = 1e-12
    val loss = -(label * math.log(p + eps) + (1 - label) * math.log(1 - p + eps))
    (loss, p - label)
  }
}
