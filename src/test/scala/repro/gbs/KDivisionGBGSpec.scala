package repro.gbs

import repro.{SparkSpec, TestData}
import scala.util.Random

class KDivisionGBGSpec extends SparkSpec {

  test("pure dataset stays one ball") {
    val data = TestData.pts1d((0.0, 0), (1.0, 0), (2.0, 0))
    val balls = KDivisionGBG.generate(data, purityThreshold = 1.0)
    assert(balls.size == 1)
    assert(balls.head.purity === 1.0)
  }

  test("two separated classes split into pure balls at threshold 1.0") {
    val data = TestData.twoBlobs(40, sep = 20.0, seed = 1)
    val balls = KDivisionGBG.generate(data, purityThreshold = 1.0, seed = 2)
    assert(balls.size >= 2)
    assert(balls.forall(b => b.purity >= 1.0 || b.size <= 2 * data.head.dim))
  }

  test("splitting stops at 2p samples even when impure") {
    // p = 1 => min size 2: an impure pair cannot be split further.
    val data = TestData.pts1d((0.0, 0), (0.1, 1))
    val balls = KDivisionGBG.generate(data, purityThreshold = 1.0)
    assert(balls.size == 1)
    assert(balls.head.purity < 1.0)
  }

  test("lower purity threshold yields fewer balls") {
    val data = TestData.twoBlobs(80, sep = 2.0, seed = 3)
    val strict = KDivisionGBG.generate(data, purityThreshold = 1.0, seed = 4)
    val loose = KDivisionGBG.generate(data, purityThreshold = 0.55, seed = 4)
    assert(loose.size <= strict.size)
  }

  test("balls partition the dataset (k-division loses no samples)") {
    val data = TestData.blobs(3, 30, seed = 5)
    val balls = KDivisionGBG.generate(data, seed = 6)
    val ids = balls.flatMap(_.points.map(_.id)).sorted
    assert(ids == data.map(_.id).sorted)
  }

  test("every emitted ball satisfies the stop condition") {
    val data = TestData.twoBlobs(100, sep = 3.0, seed = 7)
    val p = data.head.dim
    val balls = KDivisionGBG.generate(data, purityThreshold = 0.9, seed = 8)
    balls.foreach(b => assert(b.purity >= 0.9 || b.size <= 2 * p,
      s"ball with purity ${b.purity} and size ${b.size} should have been split"))
  }

  test("kDivide separates a two-class set by class centroids") {
    val data = TestData.pts1d((0.0, 0), (1.0, 0), (10.0, 1), (11.0, 1))
    val children = KDivisionGBG.kDivide(data, new Random(1))
    assert(children.size == 2)
    assert(children.forall(c => c.map(_.label).distinct.size == 1))
  }

  test("kDivide on a single-class set returns it unchanged") {
    val data = TestData.pts1d((0.0, 0), (1.0, 0))
    assert(KDivisionGBG.kDivide(data, new Random(2)) == Vector(data))
  }

  test("kDivide handles coincident class centroids via random bisection") {
    // Both classes share the same centroid: interleaved symmetric points.
    val data = TestData.pts1d((-1.0, 0), (1.0, 0), (-1.0, 1), (1.0, 1))
    val children = KDivisionGBG.kDivide(data, new Random(3))
    assert(children.size >= 2)
    assert(children.map(_.size).sum == 4)
  }

  test("generation terminates on adversarial duplicated coordinates") {
    val data = Vector.tabulate(20)(i => repro.core.Point(Array(1.0, 2.0), i % 2, i.toLong))
    val balls = KDivisionGBG.generate(data, purityThreshold = 1.0, seed = 9)
    assert(balls.flatMap(_.points).size == 20)
  }

  test("empty input gives no balls") {
    assert(KDivisionGBG.generate(Vector.empty).isEmpty)
  }

  test("determinism in the seed") {
    val data = TestData.twoBlobs(60, sep = 2.5, seed = 10)
    val a = KDivisionGBG.generate(data, seed = 11).map(_.points.map(_.id))
    val b = KDivisionGBG.generate(data, seed = 11).map(_.points.map(_.id))
    assert(a == b)
  }
}
