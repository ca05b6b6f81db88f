package repro.core.emf

import org.scalatest.funsuite.AnyFunSuite
import repro.core.encode.EncoderConfig
import repro.core.ir.Catalogs
import repro.gen.Workloads
import repro.ml.Confusion
import scala.util.Random

class EmfSpec extends AnyFunSuite {

  private val tpchCfg  = EncoderConfig.forSchema(Catalogs.tpchLite)
  private val tpcdsCfg = EncoderConfig.forSchema(Catalogs.tpcdsLite)

  private def asTriples(pairs: Seq[Workloads.LabeledPair]) =
    pairs.map(lp => (lp.a, lp.b, lp.label))

  test("full-model gradient check (dropout 0)") {
    val emf = new Emf(seed = 1, dropout = 0.0)
    val pair = Workloads.labeledPairs(Catalogs.tpchLite, 2, seed = 1).head
    val (a, b) = emf.encodePair(pair.a, pair.b, tpchCfg)
    val eps = 1e-5
    emf.model.params.foreach(_.zeroGrad())
    emf.model.accumulateGradients(a, b, pair.label)
    val rng = new Random(2)
    var checked = 0
    emf.model.params.foreach { p =>
      for (_ <- 0 until 4) {
        val i = rng.nextInt(p.size)
        val orig = p.v(i)
        p.v(i) = orig + eps; val up = emf.model.loss(a, b, pair.label)
        p.v(i) = orig - eps; val dn = emf.model.loss(a, b, pair.label)
        p.v(i) = orig
        val num = (up - dn) / (2 * eps)
        assert(math.abs(num - p.g(i)) < 1e-3 * math.max(1.0, math.abs(num)),
          s"numeric=$num analytic=${p.g(i)}")
        checked += 1
      }
    }
    assert(checked >= 40)
  }

  test("training reduces loss") {
    val emf = new Emf(seed = 3, dropout = 0.2)
    val data = emf.encodeDataset(asTriples(
      Workloads.labeledPairs(Catalogs.tpchLite, 200, seed = 3)), tpchCfg)
    val first = emf.model.trainEpoch(data)
    var last = first
    for (_ <- 0 until 7) last = emf.model.trainEpoch(data)
    assert(last < first * 0.7, s"loss $first -> $last")
  }

  test("EMF learns equivalence on TPC-H and transfers to TPC-DS") {
    val emf = new Emf(seed = 4, dropout = 0.2)
    val train = asTriples(Workloads.labeledPairs(Catalogs.tpchLite, 700, seed = 4))
    emf.fit(train, tpchCfg, epochs = 14)

    def eval(pairs: Seq[(repro.core.ir.Ir.Plan, repro.core.ir.Ir.Plan, Boolean)],
             cfg: EncoderConfig): Confusion =
      Confusion.of(pairs.map(p => emf.predict(p._1, p._2, cfg)), pairs.map(_._3))

    val heldOut = eval(asTriples(Workloads.labeledPairs(Catalogs.tpchLite, 200, seed = 5)), tpchCfg)
    assert(heldOut.accuracy > 0.80, s"held-out accuracy ${heldOut.accuracy}")

    val transfer = eval(asTriples(Workloads.labeledPairs(Catalogs.tpcdsLite, 200, seed = 6)), tpcdsCfg)
    assert(transfer.accuracy > 0.72, s"transfer accuracy ${transfer.accuracy}")
  }

  test("fine-tuning a degenerate model improves it (incremental training works)") {
    val emf = new Emf(seed = 7, dropout = 0.2)
    // Degenerate: single-table queries only (the §7.3 setup).
    val degenerate = asTriples(
      Workloads.labeledPairs(Catalogs.tpchLite, 300, seed = 7, maxTables = 1))
    emf.fit(degenerate, tpchCfg, epochs = 8)

    val test = asTriples(Workloads.labeledPairs(Catalogs.tpcdsLite, 150, seed = 8))
    def acc(): Double =
      Confusion.of(test.map(p => emf.predict(p._1, p._2, tpcdsCfg)), test.map(_._3)).accuracy

    val before = acc()
    val newData = asTriples(Workloads.labeledPairs(Catalogs.tpcdsLite, 400, seed = 9))
    emf.fit(newData, tpcdsCfg, epochs = 8) // fine-tune, optimizer state kept
    val after = acc()
    assert(after > before - 0.02, s"fine-tuning regressed: $before -> $after")
    assert(after > 0.7, s"after fine-tuning accuracy $after")
  }

  test("predictions are symmetric-ish probabilities in [0,1]") {
    val emf = new Emf(seed = 10)
    val pairs = Workloads.labeledPairs(Catalogs.tpchLite, 20, seed = 10)
    pairs.foreach { lp =>
      val p = emf.predictProb(lp.a, lp.b, tpchCfg)
      assert(p >= 0.0 && p <= 1.0)
    }
  }

  test("embed returns fixed-size finite summaries") {
    val emf = new Emf(seed = 11)
    val pairs = Workloads.labeledPairs(Catalogs.tpchLite, 10, seed = 11)
    pairs.foreach { lp =>
      val (a, b) = emf.encodePair(lp.a, lp.b, tpchCfg)
      val e = emf.model.embed(a)
      assert(e.length == emf.model.embedDim)
      e.foreach(x => assert(!x.isNaN && !x.isInfinite))
      assert(emf.model.embed(b).length == emf.model.embedDim)
    }
  }

  test("pooledFeatures has the 2×|NV| concat layout for RF/LR baselines") {
    val emf = new Emf(seed = 12)
    val lp = Workloads.labeledPairs(Catalogs.tpchLite, 2, seed = 12).head
    val f = emf.pooledFeatures(lp.a, lp.b, tpchCfg)
    assert(f.length == 2 * emf.agn.nvSize)
  }

  test("model size and parameter count are reported") {
    val emf = new Emf(seed = 13)
    assert(emf.model.paramCount > 10000)
  }
}
