package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces Table 4 (§7.1.3): the TPC-H-trained EMF evaluated zero-shot on
  * randomly-generated schemas at the paper's dataset sizes (1.2k–44.9k).
  */
class Table4Bench extends AnyFunSuite {

  test("Table 4: transfer learning on randomly-generated schemas") {
    val rows = Experiments.table4(BenchModels.emf)
    println(Experiments.renderTable4(rows))

    assert(rows.map(_.size) == Vector(1200, 5000, 11000, 19900, 44900))
    rows.foreach { r =>
      // Paper: precision 0.88–0.94, recall 0.96–0.99 — high across sizes.
      assert(r.recall > 0.80, s"size ${r.size}: recall ${r.recall}")
      assert(r.precision > 0.70, s"size ${r.size}: precision ${r.precision}")
      assert(r.f1 > 0.78, s"size ${r.size}: F1 ${r.f1}")
    }
  }
}
