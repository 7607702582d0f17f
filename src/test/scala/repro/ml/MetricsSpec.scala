package repro.ml

import repro.SparkSpec

class MetricsSpec extends SparkSpec {

  test("accuracy of a perfect prediction is 1") {
    assert(Metrics.accuracy(Seq(1, 0, 1), Seq(1, 0, 1)) === 1.0)
  }

  test("accuracy of an all-wrong prediction is 0") {
    assert(Metrics.accuracy(Seq(1, 1, 1), Seq(0, 0, 0)) === 0.0)
  }

  test("accuracy counts partial agreement") {
    assert(Metrics.accuracy(Seq(1, 0, 1, 0), Seq(1, 0, 0, 1)) === 0.5)
  }

  test("accuracy rejects mismatched lengths") {
    intercept[IllegalArgumentException] { Metrics.accuracy(Seq(1), Seq(1, 2)) }
  }

  test("accuracy rejects empty input") {
    intercept[IllegalArgumentException] { Metrics.accuracy(Seq.empty, Seq.empty) }
  }

  test("gmean of a perfect prediction is 1") {
    assert(Metrics.gmean(Seq(0, 1, 0, 1), Seq(0, 1, 0, 1)) === 1.0)
  }

  test("gmean is 0 when one class is entirely missed") {
    assert(Metrics.gmean(Seq(0, 0, 0, 0), Seq(0, 0, 1, 1)) === 0.0)
  }

  test("gmean is the geometric mean of per-class recalls") {
    // class 0 recall 1.0, class 1 recall 0.5 => sqrt(0.5)
    val g = Metrics.gmean(Seq(0, 0, 1, 0), Seq(0, 0, 1, 1))
    assert(math.abs(g - math.sqrt(0.5)) < 1e-12)
  }

  test("gmean handles three classes") {
    // recalls: 1.0, 0.5, 1.0 => (0.5)^(1/3)
    val g = Metrics.gmean(Seq(0, 1, 2, 2, 1), Seq(0, 1, 2, 2, 2))
    assert(math.abs(g - math.pow(2.0 / 3.0, 1.0 / 3.0)) < 1e-12)
  }

  test("gmean equals accuracy for balanced binary perfect-per-class splits") {
    val pred = Seq(0, 1, 0, 1); val act = Seq(0, 1, 1, 0)
    assert(Metrics.gmean(pred, act) === 0.0 || Metrics.gmean(pred, act) <= 1.0)
  }

  test("metrics stay in [0,1] on random inputs") {
    val rng = new scala.util.Random(1)
    for (_ <- 0 until 50) {
      val n = 5 + rng.nextInt(20)
      val pred = Seq.fill(n)(rng.nextInt(3))
      val act = Seq.fill(n)(rng.nextInt(3))
      val a = Metrics.accuracy(pred, act); val g = Metrics.gmean(pred, act)
      assert(a >= 0.0 && a <= 1.0)
      assert(g >= 0.0 && g <= 1.0)
    }
  }
}
