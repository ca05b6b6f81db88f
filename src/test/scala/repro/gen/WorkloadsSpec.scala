package repro.gen

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ir.Catalogs
import repro.core.sf.SchemaFilter
import repro.verifier.Verifier

class WorkloadsSpec extends AnyFunSuite {

  private val av = new Verifier()

  test("labeledPairs labels agree with the verifier") {
    val pairs = Workloads.labeledPairs(Catalogs.tpchLite, n = 60, seed = 1)
    assert(pairs.size == 60)
    pairs.foreach { lp =>
      assert(av.equivalent(lp.a, lp.b) == lp.label)
    }
  }

  test("labeledPairs are roughly class-balanced") {
    val pairs = Workloads.labeledPairs(Catalogs.tpchLite, n = 200, seed = 2)
    val pos = pairs.count(_.label)
    assert(pos >= 80 && pos <= 120, s"positives=$pos of 200")
  }

  test("labeledPairs pairs are SF-compatible (negatives are non-trivial)") {
    val pairs = Workloads.labeledPairs(Catalogs.tpchLite, n = 100, seed = 3)
    pairs.foreach(lp => assert(SchemaFilter.admits(lp.a, lp.b)))
  }

  test("labeledPairs honors maxTables (degenerate no-join workloads)") {
    val pairs = Workloads.labeledPairs(Catalogs.tpchLite, n = 40, seed = 4, maxTables = 1)
    pairs.foreach { lp =>
      assert(lp.a.atoms.size == 1 && lp.b.atoms.size == 1)
    }
  }

  test("evalWorkload plants the requested number of subexpressions") {
    val es = Workloads.evalWorkload(Catalogs.tpcdsLite, nSubexprs = 60, nClasses = 6, seed = 5)
    assert(es.subexprs.size == 60)
    assert(es.numPairs == 60L * 59 / 2)
  }

  test("evalWorkload ground truth contains at least the planted classes") {
    val es = Workloads.evalWorkload(Catalogs.tpcdsLite, nSubexprs = 50, nClasses = 5, seed = 6)
    assert(es.truth.size >= 5, s"truth=${es.truth.size}")
    // Every truth pair must actually be verifier-equivalent.
    es.truth.foreach { case (i, j) =>
      assert(av.equivalent(es.subexprs(i), es.subexprs(j)))
    }
  }

  test("evalWorkload ground truth is exactly the verifier-positive pair set") {
    val es = Workloads.evalWorkload(Catalogs.tpchLite, nSubexprs = 30, nClasses = 3, seed = 7)
    val brute = (for {
      i <- es.subexprs.indices
      j <- (i + 1) until es.subexprs.size
      if av.equivalent(es.subexprs(i), es.subexprs(j))
    } yield (i, j)).toSet
    assert(es.truth == brute)
  }

  test("evalWorkload SF-groups are populated (moderate SF selectivity)") {
    val es = Workloads.evalWorkload(Catalogs.tpcdsLite, nSubexprs = 80, nClasses = 8, seed = 8)
    val groups = SchemaFilter.groups(es.subexprs)
    val intra = groups.map(g => g.size.toLong * (g.size - 1) / 2).sum
    // A meaningful fraction of pairs must survive the SF, else later filters
    // have nothing to do (paper's SF TNR is only 0.37).
    assert(intra >= es.numPairs / 20, s"intra=$intra of ${es.numPairs}")
  }
}
