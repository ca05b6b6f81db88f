package repro.core.ssfl

import org.scalatest.funsuite.AnyFunSuite
import repro.core.emf.Emf
import repro.core.encode.EncoderConfig
import repro.core.ir.Catalogs
import repro.core.vmf.Vmf
import repro.gen.Workloads
import repro.verifier.Verifier

class SsflSpec extends AnyFunSuite {

  private val cfg = EncoderConfig.forSchema(Catalogs.tpchLite)

  /** Degenerate-trained EMF (single-table workload, §7.3's cold-start). */
  private def degenerateEmf(seed: Long): Emf = {
    val m = new Emf(seed = seed, dropout = 0.2)
    val train = Workloads.labeledPairs(Catalogs.tpchLite, 250, seed = seed, maxTables = 1)
      .map(lp => (lp.a, lp.b, lp.label))
    m.fit(train, cfg, epochs = 8)
    m
  }

  private def mkSsfl(emf: Emf, th: Double = 0.9): Ssfl = {
    val cal = Workloads.labeledPairs(Catalogs.tpchLite, 100, seed = 41, maxTables = 1)
      .map(lp => (lp.a, lp.b, lp.label))
    val vmf = new Vmf(emf, Vmf.calibrate(emf, cal, cfg))
    new Ssfl(emf, vmf, new Verifier(), cfg, th = th)
  }

  // Join-heavy workload the degenerate model has never seen.
  private def joinWorkload(seed: Long): Vector[repro.core.ir.Ir.Plan] =
    Workloads.evalWorkload(Catalogs.tpchLite, nSubexprs = 40, nClasses = 8, seed = seed).subexprs

  test("confidence is a fraction in [0,1]") {
    val ssfl = mkSsfl(degenerateEmf(42))
    val c = ssfl.confidence(joinWorkload(42))
    assert(c >= 0.0 && c <= 1.0)
  }

  test("filter-balanced sampling yields both classes; random sampling yields almost no positives") {
    val emf = degenerateEmf(43)
    val ssfl = mkSsfl(emf)
    val w = joinWorkload(43)

    val balanced = ssfl.filterBalancedSample(w, cap = 64)
    val bPos = balanced.count(_._3)
    assert(bPos > 0, "filter-balanced sample found no positives")
    assert(balanced.exists(!_._3), "filter-balanced sample has no negatives")

    val random = ssfl.randomSample(w, cap = 64)
    val rPos = random.count(_._3)
    // Positives are rare events under uniform sampling (§6's motivation).
    assert(rPos <= bPos, s"random sampling found $rPos positives vs balanced $bPos")
  }

  test("filter-balanced sample labels agree with the verifier") {
    val ssfl = mkSsfl(degenerateEmf(44))
    val av = new Verifier()
    ssfl.filterBalancedSample(joinWorkload(44), cap = 32).foreach { case (a, b, l) =>
      assert(av.equivalent(a, b) == l)
    }
  }

  test("step fine-tunes when confidence is below threshold") {
    val emf = degenerateEmf(45)
    val ssfl = mkSsfl(emf, th = 0.999) // force low confidence
    val (cl, tuned) = ssfl.step(joinWorkload(45), batch = 48, epochs = 2)
    assert(cl < 0.999)
    assert(tuned, "SSFL should fine-tune under a strict threshold")
  }

  test("step skips fine-tuning when already confident") {
    val emf = degenerateEmf(46)
    val ssfl = mkSsfl(emf, th = 0.0)
    val (_, tuned) = ssfl.step(joinWorkload(46))
    assert(!tuned)
  }

  test("run iterates and eventually stops") {
    val emf = degenerateEmf(47)
    val ssfl = mkSsfl(emf, th = 0.8)
    val history = ssfl.run(joinWorkload(47), maxRounds = 3, batch = 48, epochs = 2)
    assert(history.nonEmpty && history.size <= 3)
  }

  test("SSFL fine-tuning improves accuracy on the drifted workload more than random sampling") {
    // Two identical degenerate models; one fine-tunes on filter-balanced
    // samples, the other on random samples of the same size (Figure 9).
    val seed = 48L
    val emfBalanced = degenerateEmf(seed)
    val emfRandom   = degenerateEmf(seed)
    val w = joinWorkload(seed)
    val testPairs = Workloads.labeledPairs(Catalogs.tpchLite, 150, seed = 49)
      .map(lp => (lp.a, lp.b, lp.label))
    def acc(m: Emf): Double =
      testPairs.count(p => m.predict(p._1, p._2, cfg) == p._3).toDouble / testPairs.size

    val ssflB = mkSsfl(emfBalanced, th = 0.999)
    for (_ <- 0 until 2) {
      val s = ssflB.filterBalancedSample(w, cap = 64)
      if (s.nonEmpty) emfBalanced.fit(s, cfg, epochs = 4)
    }
    val ssflR = mkSsfl(emfRandom, th = 0.999)
    for (_ <- 0 until 2) {
      val s = ssflR.randomSample(w, cap = 64)
      if (s.nonEmpty) emfRandom.fit(s, cfg, epochs = 4)
    }
    val (aB, aR) = (acc(emfBalanced), acc(emfRandom))
    assert(aB >= aR - 0.05, s"balanced=$aB random=$aR")
  }
}
