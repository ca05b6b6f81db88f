package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table 3 (§7.1.1): MLP vs RF vs LR equivalence classifiers,
  * trained on TPC-H-lite and tested on TPC-DS-lite.
  */
class Table3Bench extends AnyFunSuite {

  test("Table 3: classifier comparison (train TPC-H, test TPC-DS)") {
    val rows = Experiments.table3(BenchModels.emf)
    println(Experiments.renderTable3(rows))

    val mlp = rows.find(_.name == "MLP").get
    val rf  = rows.find(_.name == "RF").get
    val lr  = rows.find(_.name == "LR").get

    // Paper shape: MLP clearly superior to both flat models.
    assert(mlp.accuracy > 0.85, s"MLP accuracy ${mlp.accuracy}")
    assert(mlp.accuracy > rf.accuracy + 0.03, s"MLP ${mlp.accuracy} vs RF ${rf.accuracy}")
    assert(mlp.accuracy > lr.accuracy + 0.03, s"MLP ${mlp.accuracy} vs LR ${lr.accuracy}")
    assert(mlp.f1 > rf.f1 && mlp.f1 > lr.f1)

    // β-error (false negatives) is the paper's key criterion: the MLP's FN
    // count must be a small fraction of the positives.
    val fnRate = mlp.confusion.fn.toDouble / (mlp.confusion.fn + mlp.confusion.tp)
    assert(fnRate < 0.15, s"MLP false-negative rate $fnRate")
  }
}
