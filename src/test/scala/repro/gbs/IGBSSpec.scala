package repro.gbs

import repro.{SparkSpec, TestData}
import scala.util.Random

class IGBSSpec extends SparkSpec {

  /** Imbalanced two-blob data: nMaj class 0, nMin class 1. */
  private def imbalanced(nMaj: Int, nMin: Int, seed: Long): Vector[repro.core.Point] = {
    val rng = new Random(seed)
    val pts = Vector.newBuilder[repro.core.Point]
    var id = 0L
    for (_ <- 0 until nMaj) { pts += repro.core.Point(Array(rng.nextGaussian(), rng.nextGaussian()), 0, id); id += 1 }
    for (_ <- 0 until nMin) { pts += repro.core.Point(Array(8 + rng.nextGaussian(), rng.nextGaussian()), 1, id); id += 1 }
    pts.result()
  }

  test("sampled set is a subset without duplicates") {
    val data = imbalanced(150, 30, 1)
    val s = IGBS.sample(data, seed = 2)
    val ids = data.map(_.id).toSet
    assert(s.forall(p => ids.contains(p.id)))
    assert(s.map(_.id).distinct.size == s.size)
  }

  test("minority samples are mostly preserved") {
    val data = imbalanced(200, 25, 3)
    val s = IGBS.sample(data, seed = 4)
    val minKept = s.count(_.label == 1)
    assert(minKept >= 20, s"IGBS should keep nearly all minority samples, kept $minKept/25")
  }

  test("majority class is undersampled on separable data") {
    val data = imbalanced(300, 30, 5)
    val s = IGBS.sample(data, seed = 6)
    val majKept = s.count(_.label == 0)
    assert(majKept < 300, "majority class should be undersampled")
  }

  test("imbalance ratio improves after sampling") {
    val data = imbalanced(300, 30, 7)
    val s = IGBS.sample(data, seed = 8)
    val maj = s.count(_.label == 0).toDouble
    val min = s.count(_.label == 1).toDouble
    assert(min > 0)
    assert(maj / min <= 300.0 / 30.0, "IR must not get worse")
  }

  test("rebalance tops the majority back up when over-shrunk") {
    val data = imbalanced(120, 100, 9)
    val s = IGBS.sample(data, seed = 10)
    val maj = s.count(_.label == 0)
    val min = s.count(_.label == 1)
    assert(maj >= math.min(min, 120) || maj == 120,
      s"majority ($maj) should be topped up toward the minority count ($min)")
  }

  test("balanced data still yields a valid sample") {
    val data = TestData.twoBlobs(100, sep = 8.0, seed = 11)
    val s = IGBS.sample(data, seed = 12)
    assert(s.nonEmpty)
    assert(s.map(_.label).distinct.size == 2)
  }

  test("empty input gives empty sample") {
    assert(IGBS.sample(Vector.empty).isEmpty)
  }

  test("determinism in the seed") {
    val data = imbalanced(100, 20, 13)
    assert(IGBS.sample(data, seed = 14).map(_.id) == IGBS.sample(data, seed = 14).map(_.id))
  }

  test("single-class dataset passes through its samples") {
    val data = TestData.pts1d((0.0, 0), (1.0, 0), (2.0, 0), (3.0, 0))
    val s = IGBS.sample(data, seed = 15)
    assert(s.nonEmpty)
    assert(s.forall(_.label == 0))
  }
}
