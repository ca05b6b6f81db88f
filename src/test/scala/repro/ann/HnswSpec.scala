package repro.ann

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class HnswSpec extends AnyFunSuite {

  private def randomVecs(n: Int, dim: Int, seed: Long): Vector[Array[Double]] = {
    val rng = new Random(seed)
    Vector.fill(n)(Array.fill(dim)(rng.nextDouble()))
  }

  test("exact match returns itself at distance 0") {
    val vecs = randomVecs(100, 8, 1)
    val idx = new Hnsw(8)
    vecs.foreach(idx.add)
    for (i <- 0 until 100 by 7) {
      val res = idx.search(vecs(i), k = 1)
      assert(res.head._1 == i || res.head._2 < 1e-12)
    }
  }

  test("kNN recall@10 vs brute force exceeds 0.85 on 2000 vectors") {
    val vecs = randomVecs(2000, 16, 2)
    val idx = new Hnsw(16, m = 12, efConstruction = 100, seed = 2)
    vecs.foreach(idx.add)
    val rng = new Random(3)
    var hit = 0; var total = 0
    for (_ <- 0 until 30) {
      val q = Array.fill(16)(rng.nextDouble())
      val exact = vecs.zipWithIndex
        .map { case (v, i) => (i, idx.dist(q, v)) }
        .sortBy(_._2).take(10).map(_._1).toSet
      val approx = idx.search(q, k = 10, ef = 100).map(_._1).toSet
      hit += (exact & approx).size; total += 10
    }
    val recall = hit.toDouble / total
    assert(recall > 0.85, s"recall=$recall")
  }

  test("radius search returns only neighbors within tau") {
    val vecs = randomVecs(500, 8, 4)
    val idx = new Hnsw(8, seed = 4)
    vecs.foreach(idx.add)
    val q = vecs(42)
    val res = idx.radius(q, tau = 0.3, ef = 64)
    res.foreach { case (i, d) =>
      assert(d <= 0.3)
      assert(math.abs(idx.dist(q, vecs(i)) - d) < 1e-12)
    }
    assert(res.exists(_._1 == 42)) // itself at distance 0
  }

  test("radius search recall against brute force on tight clusters") {
    val rng = new Random(5)
    // 50 clusters of 6 near-duplicates: radius search must find cluster mates.
    val centers = Vector.fill(50)(Array.fill(8)(rng.nextDouble() * 10))
    val vecs = centers.flatMap(c => Vector.fill(6)(c.map(_ + rng.nextGaussian() * 0.01)))
    val idx = new Hnsw(8, seed = 5)
    vecs.foreach(idx.add)
    var found = 0; var expected = 0
    for (i <- vecs.indices by 6) {
      val mates = (i until i + 6).toSet
      val res = idx.radius(vecs(i), tau = 0.5, ef = 64).map(_._1).toSet
      found += (res & mates).size
      expected += 6
    }
    assert(found.toDouble / expected > 0.9, s"cluster recall ${found.toDouble / expected}")
  }

  test("empty index searches return nothing") {
    val idx = new Hnsw(4)
    assert(idx.search(Array(0.0, 0.0, 0.0, 0.0), 5).isEmpty)
  }

  test("dimension mismatch is rejected") {
    val idx = new Hnsw(4)
    assertThrows[IllegalArgumentException](idx.add(Array(1.0, 2.0)))
  }
}
