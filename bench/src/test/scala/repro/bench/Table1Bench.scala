package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table 1 (§7.5 setting): per-filter time/TPR/TNR over a ~50k-
  * pair TPC-DS-lite workload with ~50 planted equivalences, the AV-on-all-
  * pairs baseline, GEqO end-to-end, the Oracle+AV lower bound, and the §7.6
  * filter ablation.
  */
class Table1Bench extends AnyFunSuite {

  test("Table 1: GEqO filter cascade vs automated verification") {
    val r = Experiments.table1(BenchModels.emf, BenchModels.vmf)
    println(Experiments.renderTable1(r))

    val Seq(sf, vmf, emf, avAll, geqo, oracle) = r.rows.map(identity)

    // Workload shape: the paper's ~50k pairs / ~50 equivalences.
    assert(r.totalPairs > 40000 && r.totalPairs < 60000)
    assert(r.equivalences >= 45)

    // TNR increases down the cascade until all negatives are gone (Table 1).
    assert(sf.tnr <= vmf.tnr + 1e-9 && vmf.tnr <= emf.tnr + 1e-9)
    assert(geqo.tnr == 1.0)

    // Filters keep near-perfect TPR; GEqO's end-to-end TPR stays high.
    assert(sf.tpr >= 0.95, s"SF TPR ${sf.tpr}")
    assert(vmf.tpr >= 0.85, s"VMF TPR ${vmf.tpr}")
    assert(geqo.tpr >= 0.70, s"GEqO TPR ${geqo.tpr}")

    // The headline: GEqO is 1–2 orders of magnitude cheaper than verifying
    // every pair, and within sight of the oracle bound.
    assert(geqo.seconds < avAll.seconds / 10,
      s"GEqO ${geqo.seconds}s vs AV-all ${avAll.seconds}s")
    assert(oracle.seconds <= geqo.seconds)

    // Ablation (§7.6): the full cascade minimizes verifier work.
    val full = r.ablation.find(_.filters == "SF+VMF+EMF").get
    assert(r.ablation.forall(a => full.avCalls <= a.avCalls),
      s"full cascade not minimal in AV calls: ${r.ablation}")
  }
}
