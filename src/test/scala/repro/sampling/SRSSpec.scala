package repro.sampling

import repro.{SparkSpec, TestData}

class SRSSpec extends SparkSpec {

  private val data = TestData.twoBlobs(100, seed = 1)

  test("sample size equals round(ratio * n)") {
    assert(SRS.sample(data, 0.5).size == 50)
    assert(SRS.sample(data, 0.33).size == 33)
    assert(SRS.sample(data, 1.0).size == 100)
  }

  test("ratio 0 yields the empty sample") {
    assert(SRS.sample(data, 0.0).isEmpty)
  }

  test("sampled points are a subset without duplicates") {
    val s = SRS.sample(data, 0.4, seed = 2)
    val ids = data.map(_.id).toSet
    assert(s.forall(p => ids.contains(p.id)))
    assert(s.map(_.id).distinct.size == s.size)
  }

  test("deterministic for a fixed seed") {
    assert(SRS.sample(data, 0.3, seed = 3).map(_.id) == SRS.sample(data, 0.3, seed = 3).map(_.id))
  }

  test("different seeds give different samples") {
    val a = SRS.sample(data, 0.3, seed = 4).map(_.id).toSet
    val b = SRS.sample(data, 0.3, seed = 5).map(_.id).toSet
    assert(a != b)
  }

  test("rejects ratios outside [0,1]") {
    intercept[IllegalArgumentException] { SRS.sample(data, -0.1) }
    intercept[IllegalArgumentException] { SRS.sample(data, 1.1) }
  }

  test("unbiasedness: class proportions are roughly preserved on average") {
    val fracs = (0 until 30).map { s =>
      val smp = SRS.sample(data, 0.5, seed = s)
      smp.count(_.label == 0).toDouble / smp.size
    }
    val meanFrac = fracs.sum / fracs.size
    assert(math.abs(meanFrac - 0.5) < 0.05, f"mean class-0 fraction $meanFrac%.3f")
  }

  test("sampling an empty dataset is empty") {
    assert(SRS.sample(Vector.empty, 0.5).isEmpty)
  }
}
