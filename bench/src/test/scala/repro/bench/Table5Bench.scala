package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table 5 (§7.2): the VMF as a standalone classifier on
  * TPC-DS-lite pairs — high recall (it must not lose equivalences), and
  * deliberately lower precision (the EMF and AV clean up behind it).
  */
class Table5Bench extends AnyFunSuite {

  test("Table 5: VMF performance (train TPC-H, test TPC-DS)") {
    val r = Experiments.table5(BenchModels.vmf)
    println(Experiments.renderTable5(r))

    // Paper: accuracy 0.74, precision 0.42, recall 0.98, F1 0.60.
    assert(r.recall > 0.90, s"VMF recall ${r.recall}")
    assert(r.accuracy > 0.55, s"VMF accuracy ${r.accuracy}")
    assert(r.precision < 1.0 && r.precision > 0.3, s"VMF precision ${r.precision}")
    assert(r.recall > r.precision, "VMF must trade precision for recall")
  }
}
