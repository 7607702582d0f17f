package repro.core

import repro.{SparkSpec, TestData}

class GBABSSpec extends SparkSpec {

  /** Three 1D balls: [−1,1] label 0, [4,6] label 1, [9,11] label 0. */
  private val threeBalls = Vector(
    GranularBall(Array(0.0), 1.0, 0, TestData.pts1d((-1.0, 0), (0.0, 0), (1.0, 0))),
    GranularBall(Array(5.0), 1.0, 1,
      Vector(Point(Array(4.0), 1, 3), Point(Array(5.0), 1, 4), Point(Array(6.0), 1, 5))),
    GranularBall(Array(10.0), 1.0, 0,
      Vector(Point(Array(9.0), 0, 6), Point(Array(10.0), 0, 7), Point(Array(11.0), 0, 8))),
  )

  test("heterogeneous adjacent pair contributes boundary-nearest samples of both balls") {
    val (sampled, borderline) = GBABS.sampleBalls(threeBalls, p = 1)
    // pair (b0,b1): left max = x=1 (id 2), right min = x=4 (id 3)
    // pair (b1,b2): left max = x=6 (id 5), right min = x=9 (id 6)
    assert(sampled.map(_.id).toSet == Set(2L, 3L, 5L, 6L))
    assert(borderline == Set(0, 1, 2))
  }

  test("homogeneous adjacent pairs contribute nothing") {
    val balls = Vector(
      GranularBall(Array(0.0), 1.0, 0, TestData.pts1d((0.0, 0))),
      GranularBall(Array(3.0), 1.0, 0, Vector(Point(Array(3.0), 0, 1))),
      GranularBall(Array(10.0), 1.0, 1, Vector(Point(Array(10.0), 1, 2))),
    )
    val (sampled, borderline) = GBABS.sampleBalls(balls, p = 1)
    // only (ball1, ball2) is heterogeneous-adjacent
    assert(sampled.map(_.id).toSet == Set(1L, 2L))
    assert(borderline == Set(1, 2))
    assert(!borderline.contains(0), "the fully interior ball is intra-class")
  }

  test("a ball flanked by heterogeneous neighbors on both sides is borderline once, samples deduped") {
    val balls = Vector(
      GranularBall(Array(0.0), 0.5, 1, TestData.pts1d((0.0, 1))),
      GranularBall(Array(2.0), 0.5, 0, Vector(Point(Array(2.0), 0, 1))),
      GranularBall(Array(4.0), 0.5, 1, Vector(Point(Array(4.0), 1, 2))),
    )
    val (sampled, borderline) = GBABS.sampleBalls(balls, p = 1)
    assert(borderline == Set(0, 1, 2))
    // middle singleton is boundary-nearest for both pairs but appears once
    assert(sampled.map(_.id).distinct.size == sampled.size)
    assert(sampled.map(_.id).toSet == Set(0L, 1L, 2L))
  }

  test("2D: borderline detection runs per dimension independently") {
    // Along x: A(0)-B(5) heterogeneous. Along y all centers equal-ordered by
    // tie-break, still adjacent heterogeneous somewhere.
    val a = GranularBall(Array(0.0, 0.0), 1.0, 0,
      TestData.pts((Seq(-1.0, 0.0), 0), (Seq(1.0, 0.0), 0)))
    val b = GranularBall(Array(5.0, 0.0), 1.0, 1,
      Vector(Point(Array(4.0, 0.0), 1, 2), Point(Array(6.0, 0.0), 1, 3)))
    val (sampled, borderline) = GBABS.sampleBalls(Vector(a, b), p = 2)
    assert(borderline == Set(0, 1))
    // x-dim: a's max-x (id 1) and b's min-x (id 2)
    assert(sampled.map(_.id).toSet.contains(1L))
    assert(sampled.map(_.id).toSet.contains(2L))
  }

  test("single ball yields no borderline samples") {
    val (sampled, borderline) = GBABS.sampleBalls(threeBalls.take(1), p = 1)
    assert(sampled.isEmpty && borderline.isEmpty)
  }

  test("run: sampled set is a subset of the input without duplicates") {
    val data = TestData.twoBlobs(80, sep = 4.0, seed = 30)
    val res = GBABS.run(data, seed = 31)
    val ids = data.map(_.id).toSet
    assert(res.sampled.forall(p => ids.contains(p.id)))
    assert(res.sampled.map(_.id).distinct.size == res.sampled.size)
  }

  test("run: compresses well-separated data below 100%") {
    val data = TestData.twoBlobs(200, sep = 12.0, seed = 32)
    val res = GBABS.run(data, seed = 33)
    assert(res.samplingRatio < 0.9, f"expected compression, ratio=${res.samplingRatio}%.2f")
    assert(res.sampled.nonEmpty)
  }

  test("run: single-class data keeps every sample (no boundary exists)") {
    val data = TestData.pts1d((0.0, 0), (1.0, 0), (2.0, 0), (3.0, 0))
    val res = GBABS.run(data, seed = 34)
    assert(res.sampled.map(_.id).sorted == data.map(_.id).sorted)
  }

  test("run: empty input yields empty result") {
    val res = GBABS.run(Vector.empty)
    assert(res.sampled.isEmpty && res.balls.isEmpty && res.samplingRatio === 0.0)
  }

  test("run: sampling ratio accounts for the original dataset size") {
    val data = TestData.twoBlobs(100, sep = 10.0, seed = 35)
    val res = GBABS.run(data, seed = 36)
    assert(res.samplingRatio === res.sampled.size.toDouble / 100)
  }

  test("run: borderline samples concentrate near the class boundary") {
    // Two 1D strips: class 0 on [0,10], class 1 on [12,22]; boundary ~11.
    val data = TestData.pts1d(
      (0 to 10).map(i => (i.toDouble, 0)) ++ (12 to 22).map(i => (i.toDouble, 1)): _*)
    val res = GBABS.run(data, rho = 3, seed = 37)
    assert(res.sampled.nonEmpty)
    val meanBoundaryDist = res.sampled.map(p => math.abs(p.features(0) - 11.0)).sum / res.sampled.size
    val meanAllDist = data.map(p => math.abs(p.features(0) - 11.0)).sum / data.size
    assert(meanBoundaryDist <= meanAllDist,
      f"sampled mean distance to boundary $meanBoundaryDist%.2f should not exceed dataset mean $meanAllDist%.2f")
  }

  test("run: GBABS compresses noisy data at least as well as GGBS (Fig 6 behaviour)") {
    val clean = TestData.twoBlobs(200, sep = 8.0, seed = 38)
    val noisy = repro.data.DatasetGen.withNoise(clean, 0.3, seed = 39)
    val rNoisy = GBABS.run(noisy, seed = 40)
    val ggbsRatio = repro.gbs.GGBS.sample(noisy, 1.0, seed = 40).size.toDouble / noisy.size
    assert(rNoisy.samplingRatio < 1.0)
    assert(rNoisy.samplingRatio <= ggbsRatio + 0.05,
      f"GBABS ${rNoisy.samplingRatio}%.2f should not exceed GGBS $ggbsRatio%.2f on noisy data")
  }

  test("run: determinism in the seed") {
    val data = TestData.blobs(3, 30, seed = 41)
    val a = GBABS.run(data, seed = 42)
    val b = GBABS.run(data, seed = 42)
    assert(a.sampled.map(_.id) == b.sampled.map(_.id))
  }

  test("run: every borderline index refers to an existing ball") {
    val data = TestData.twoBlobs(60, sep = 5.0, seed = 43)
    val res = GBABS.run(data, seed = 44)
    assert(res.borderlineIdx.forall(i => i >= 0 && i < res.balls.size))
  }

  test("run: multi-class data samples from every boundary region") {
    val data = TestData.blobs(3, 40, sep = 9.0, seed = 45)
    val res = GBABS.run(data, seed = 46)
    // every class should contribute at least one borderline sample
    assert(res.sampled.map(_.label).distinct.sorted == Vector(0, 1, 2))
  }
}
