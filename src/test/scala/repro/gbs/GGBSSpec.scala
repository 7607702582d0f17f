package repro.gbs

import repro.core.GranularBall
import repro.{SparkSpec, TestData}

class GGBSSpec extends SparkSpec {

  test("small datasets pass through entirely (small-ball rule)") {
    // p=1 => 2p=2; but whole-set purity 1.0 makes it one ball of size 3 > 2p,
    // so it is sampled as a large ball; craft a <=2p case instead:
    val data = TestData.pts1d((0.0, 0), (5.0, 1))
    val s = GGBS.sample(data)
    assert(s.map(_.id).toSet == Set(0L, 1L))
  }

  test("large pure 1D ball keeps the two axis-extreme-nearest homogeneous samples") {
    val data = TestData.pts1d((0 to 10).map(i => (i.toDouble, 0)): _*)
    // single pure ball, center 5, radius = mean|x-5| = 30/11
    val s = GGBS.sample(data)
    val r = 30.0 / 11.0
    val targets = Set(5.0 - r, 5.0 + r)
    val expected = targets.map(t => data.minBy(p => math.abs(p.features(0) - t)).id)
    assert(s.map(_.id).toSet == expected)
  }

  test("sampled set is a subset of the input without duplicates") {
    val data = TestData.twoBlobs(100, sep = 6.0, seed = 1)
    val s = GGBS.sample(data, seed = 2)
    val ids = data.map(_.id).toSet
    assert(s.forall(p => ids.contains(p.id)))
    assert(s.map(_.id).distinct.size == s.size)
  }

  test("large balls contribute at most 2p samples each") {
    val data = TestData.twoBlobs(200, dim = 2, sep = 15.0, seed = 3)
    val p = 2
    val balls = KDivisionGBG.generate(data, seed = 4)
    balls.filter(_.size > 2 * p).foreach { b =>
      assert(GGBS.sampleLargeBall(b, p).size <= 2 * p)
    }
  }

  test("sampleLargeBall only returns homogeneous samples") {
    val pts = TestData.pts1d((0.0, 0), (1.0, 0), (2.0, 0), (3.0, 1))
    val ball = GranularBall.meanBall(pts)
    val s = GGBS.sampleLargeBall(ball, 1)
    assert(s.forall(_.label == ball.label))
  }

  test("sampleLargeBall on a ball with no homogeneous samples is empty") {
    val ball = GranularBall(Array(0.0), 1.0, 9, TestData.pts1d((0.0, 0), (0.5, 1)))
    assert(GGBS.sampleLargeBall(ball, 1).isEmpty)
  }

  test("compression on separated low-dimensional data is substantial") {
    val data = TestData.twoBlobs(300, dim = 2, sep = 14.0, seed = 5)
    val s = GGBS.sample(data, seed = 6)
    assert(s.size < data.size, "GGBS must compress separable data")
  }

  test("high-dimensional small data defeats GGBS compression (paper's S7 observation)") {
    // n <= 2p: the single ball is 'small', so the ratio is 1.0.
    val dim = 20
    val data = TestData.twoBlobs(30, dim = dim, sep = 2.0, seed = 7)
    val s = GGBS.sample(data, seed = 8)
    assert(s.size == data.size)
  }

  test("empty input gives empty sample") {
    assert(GGBS.sample(Vector.empty).isEmpty)
  }

  test("determinism in the seed") {
    val data = TestData.twoBlobs(80, sep = 3.0, seed = 9)
    assert(GGBS.sample(data, seed = 10).map(_.id) == GGBS.sample(data, seed = 10).map(_.id))
  }

  test("GBABS compresses harder than GGBS on multi-class separable data") {
    val data = TestData.blobs(4, 60, sep = 12.0, seed = 11)
    val gbabs = repro.core.GBABS.run(data, seed = 12).sampled.size
    val ggbs = GGBS.sample(data, seed = 12).size
    assert(gbabs <= data.size && ggbs <= data.size)
  }
}
