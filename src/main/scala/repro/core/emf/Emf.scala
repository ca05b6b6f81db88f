package repro.core.emf

import repro.core.encode.{DbAgnostic, EncodedPlan, EncoderConfig, NodeVector}
import repro.core.ir.Ir.Plan
import repro.ml._
import scala.util.Random

/** The Equivalence Model Filter network (§5): two tree-convolution layers
  * with PReLU activations, dynamic max pooling into a fixed-size summary of
  * each subexpression, then three fully connected layers with dropout
  * classifying the pair. Trained with Adam (lr 1e-3, weight decay 5e-4) on
  * BCE loss. Incremental fine-tuning (the property that made the paper pick
  * an MLP over RF/LR) works by construction: optimizer state persists across
  * `fit` calls.
  *
  * Deviation noted in DESIGN.md: the FC input is the siamese pairing
  * `[e1, e2, |e1−e2|, e1⊙e2]` and batch norm is omitted.
  */
final class EmfModel(val nvSize: Int, conv1Out: Int = 64, conv2Out: Int = 32,
                     fc1Out: Int = 64, fc2Out: Int = 32,
                     dropout: Double = 0.5, seed: Long = 42) {
  private val rng = new Random(seed)

  val conv1 = new TreeConv(nvSize, conv1Out, rng)
  val act1  = new PRelu(rng)
  val conv2 = new TreeConv(conv1Out, conv2Out, rng)
  val act2  = new PRelu(rng)
  val fc1   = new Dense(4 * conv2Out, fc1Out, rng)
  val actF1 = new PRelu(rng)
  val drop1 = new Dropout(dropout)
  val fc2   = new Dense(fc1Out, fc2Out, rng)
  val actF2 = new PRelu(rng)
  val drop2 = new Dropout(dropout)
  val fc3   = new Dense(fc2Out, 1, rng)

  val params: Seq[Param] =
    conv1.params ++ act1.params ++ conv2.params ++ act2.params ++
      fc1.params ++ actF1.params ++ fc2.params ++ actF2.params ++ fc3.params
  private val opt = new Adam(params)

  def paramCount: Long = params.map(_.size.toLong).sum

  /** The embedding dimension h of a plan summary (§3.2). */
  def embedDim: Int = conv2.out

  // ---------------------------------------------------------------------
  // Tower: encoded plan → fixed-size summary, with saved intermediates.
  // ---------------------------------------------------------------------
  private final case class TowerCtx(ep: EncodedPlan,
                                    h1: Array[Array[Double]], a1: Array[Array[Double]],
                                    h2: Array[Array[Double]], a2: Array[Array[Double]],
                                    pooled: Array[Double], arg: Array[Int])

  private def towerForward(ep: EncodedPlan): TowerCtx = {
    val h1 = conv1.forward(ep.nodes, ep.left, ep.right)
    val a1 = h1.map(act1.forward)
    val h2 = conv2.forward(a1, ep.left, ep.right)
    val a2 = h2.map(act2.forward)
    val (pooled, arg) = MaxPool.forward(a2)
    TowerCtx(ep, h1, a1, h2, a2, pooled, arg)
  }

  private def towerBackward(ctx: TowerCtx, gPooled: Array[Double]): Unit = {
    val gA2 = MaxPool.backward(ctx.a2.length, ctx.arg, gPooled)
    val gH2 = ctx.h2.indices.map(i => act2.backward(ctx.h2(i), gA2(i))).toArray
    val gA1 = conv2.backward(ctx.a1, ctx.ep.left, ctx.ep.right, gH2)
    val gH1 = ctx.h1.indices.map(i => act1.backward(ctx.h1(i), gA1(i))).toArray
    conv1.backward(ctx.ep.nodes, ctx.ep.left, ctx.ep.right, gH1)
  }

  /** Plan summary via the trained tree convolutions — this is the embedding
    * the VMF reuses (§2.2: "the VMF utilizes the learned tree convolution
    * from EMF").
    */
  def embed(ep: EncodedPlan): Array[Double] = towerForward(ep).pooled

  // ---------------------------------------------------------------------
  // Pair head.
  // ---------------------------------------------------------------------
  private def pairFeatures(e1: Array[Double], e2: Array[Double]): Array[Double] = {
    val d = e1.length
    val z = new Array[Double](4 * d)
    var i = 0
    while (i < d) {
      z(i) = e1(i); z(d + i) = e2(i)
      z(2 * d + i) = math.abs(e1(i) - e2(i))
      z(3 * d + i) = e1(i) * e2(i)
      i += 1
    }
    z
  }

  private final case class PairCtx(t1: TowerCtx, t2: TowerCtx, z: Array[Double],
                                   y1: Array[Double], p1: Array[Double], m1: Array[Double],
                                   y2: Array[Double], p2: Array[Double], m2: Array[Double],
                                   logit: Double)

  private def pairForward(a: EncodedPlan, b: EncodedPlan, training: Boolean,
                          dropRng: Random): PairCtx = {
    val t1 = towerForward(a)
    val t2 = towerForward(b)
    val z  = pairFeatures(t1.pooled, t2.pooled)
    val y1 = fc1.forward(z)
    val p1 = actF1.forward(y1)
    val (d1, m1) = drop1.forward(p1, dropRng, training)
    val y2 = fc2.forward(d1)
    val p2 = actF2.forward(y2)
    val (d2, m2) = drop2.forward(p2, dropRng, training)
    val logit = fc3.forward(d2)(0)
    PairCtx(t1, t2, z, y1, d1, m1, y2, d2, m2, logit)
  }

  private def pairBackward(ctx: PairCtx, dLogit: Double): Unit = {
    val gD2 = fc3.backward(ctx.p2, Array(dLogit))
    val gP2 = drop2.backward(ctx.m2, gD2)
    val gY2 = actF2.backward(ctx.y2, gP2)
    val gD1 = fc2.backward(ctx.p1, gY2)
    val gP1 = drop1.backward(ctx.m1, gD1)
    val gY1 = actF1.backward(ctx.y1, gP1)
    val gZ  = fc1.backward(ctx.z, gY1)
    // Split pair-feature gradient back to the two summaries.
    val d = ctx.t1.pooled.length
    val g1 = new Array[Double](d)
    val g2 = new Array[Double](d)
    var i = 0
    while (i < d) {
      val e1 = ctx.t1.pooled(i); val e2 = ctx.t2.pooled(i)
      val sgn = if (e1 - e2 >= 0) 1.0 else -1.0
      g1(i) = gZ(i) + gZ(2 * d + i) * sgn + gZ(3 * d + i) * e2
      g2(i) = gZ(d + i) - gZ(2 * d + i) * sgn + gZ(3 * d + i) * e1
      i += 1
    }
    towerBackward(ctx.t1, g1)
    towerBackward(ctx.t2, g2)
  }

  def logit(a: EncodedPlan, b: EncodedPlan): Double =
    pairForward(a, b, training = false, rng).logit

  /** BCE loss of one pair (no gradient side effects; inference mode). */
  def loss(a: EncodedPlan, b: EncodedPlan, label: Boolean): Double =
    NnOps.bceWithLogit(logit(a, b), if (label) 1.0 else 0.0)._1

  /** Forward+backward of one pair, accumulating gradients into `params`
    * (deterministic when dropout is 0) — used by gradient-check tests.
    */
  def accumulateGradients(a: EncodedPlan, b: EncodedPlan, label: Boolean): Double = {
    val ctx = pairForward(a, b, training = true, rng)
    val (l, dLogit) = NnOps.bceWithLogit(ctx.logit, if (label) 1.0 else 0.0)
    pairBackward(ctx, dLogit)
    l
  }

  def predictProb(a: EncodedPlan, b: EncodedPlan): Double = NnOps.sigmoid(logit(a, b))

  /** One pass over `data` in minibatches; returns mean loss. */
  def trainEpoch(data: IndexedSeq[((EncodedPlan, EncodedPlan), Boolean)],
                 batchSize: Int = 32, epochRng: Random = rng): Double = {
    val idx = epochRng.shuffle(data.indices.toVector)
    var totalLoss = 0.0
    idx.grouped(batchSize).foreach { batch =>
      opt.zeroGrad()
      batch.foreach { i =>
        val ((a, b), label) = data(i)
        val ctx = pairForward(a, b, training = true, epochRng)
        val (loss, dLogit) = NnOps.bceWithLogit(ctx.logit, if (label) 1.0 else 0.0)
        totalLoss += loss
        pairBackward(ctx, dLogit)
      }
      opt.step(batch.size)
    }
    totalLoss / data.size
  }

  def fit(data: IndexedSeq[((EncodedPlan, EncodedPlan), Boolean)],
          epochs: Int, batchSize: Int = 32, verbose: Boolean = false): Unit = {
    for (e <- 0 until epochs) {
      val loss = trainEpoch(data, batchSize)
      if (verbose) Console.err.println(f"[EmfModel] epoch $e%2d loss $loss%.4f")
    }
  }
}

/** The EMF filter: schema-aware encoding front-end over [[EmfModel]]. The
  * model itself is db-agnostic (§4.2); this wrapper instance-encodes plans
  * under a per-schema [[EncoderConfig]] and converts pairs through the
  * §4.2.1 converter before prediction, so one trained model serves any
  * schema (Table 3/4 transfer setting).
  */
final class Emf(val agn: EncoderConfig = EncoderConfig.agnostic(), seed: Long = 42,
                dropout: Double = 0.5) {
  val model = new EmfModel(agn.nvSize, dropout = dropout, seed = seed)

  def encodePair(p: Plan, q: Plan, inst: EncoderConfig): (EncodedPlan, EncodedPlan) =
    DbAgnostic.encodePair(
      NodeVector.encodeInstance(p, inst),
      NodeVector.encodeInstance(q, inst),
      inst, agn)

  def encodeDataset(pairs: Seq[(Plan, Plan, Boolean)], inst: EncoderConfig)
      : IndexedSeq[((EncodedPlan, EncodedPlan), Boolean)] =
    pairs.map { case (p, q, l) => (encodePair(p, q, inst), l) }.toIndexedSeq

  def predictProb(p: Plan, q: Plan, inst: EncoderConfig): Double = {
    val (a, b) = encodePair(p, q, inst)
    model.predictProb(a, b)
  }

  /** Prediction over pre-computed instance encodings (pairwise conversion
    * through the §4.2.1 converter) — the online-inference fast path.
    */
  def predictProbInstanceEncoded(a: EncodedPlan, b: EncodedPlan, inst: EncoderConfig): Double = {
    val (ca, cb) = DbAgnostic.encodePair(a, b, inst, agn)
    model.predictProb(ca, cb)
  }

  def predict(p: Plan, q: Plan, inst: EncoderConfig, threshold: Double = 0.5): Boolean =
    predictProb(p, q, inst) >= threshold

  /** Train (or incrementally fine-tune — optimizer state persists). */
  def fit(pairs: Seq[(Plan, Plan, Boolean)], inst: EncoderConfig,
          epochs: Int = 20, batchSize: Int = 32, verbose: Boolean = false): Unit =
    model.fit(encodeDataset(pairs, inst), epochs, batchSize, verbose)

  /** Pooled NV features for the flat RF/LR baselines of Table 3: the plain
    * concatenation `[maxpool(NV_α(a)), maxpool(NV_α(b))]`. As in the paper,
    * the flat models receive the same featurization with no engineered
    * pairing structure — learning the cross-side correspondence is exactly
    * what they fail at and the MLP succeeds at.
    */
  def pooledFeatures(p: Plan, q: Plan, inst: EncoderConfig): Array[Double] = {
    val (a, b) = encodePair(p, q, inst)
    val pa = MaxPool.forward(a.nodes)._1
    val pb = MaxPool.forward(b.nodes)._1
    val d = pa.length
    val out = new Array[Double](2 * d)
    var i = 0
    while (i < d) {
      out(i) = pa(i); out(d + i) = pb(i)
      i += 1
    }
    out
  }
}
