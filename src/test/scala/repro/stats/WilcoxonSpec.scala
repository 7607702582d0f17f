package repro.stats

import repro.SparkSpec

class WilcoxonSpec extends SparkSpec {

  test("n=13, all differences positive: exact p matches the paper's 0.000244") {
    val a = (1 to 13).map(i => 1.0 + i * 0.01)
    val b = (1 to 13).map(_ => 1.0)
    val r = Wilcoxon.signedRank(a, b)
    assert(r.w === 0.0)
    assert(math.abs(r.pTwoSided - 2.0 / 8192) < 1e-12)
  }

  test("n=12, all differences positive: exact p is 0.000488") {
    val a = (1 to 12).map(i => 1.0 + i * 0.01)
    val b = (1 to 12).map(_ => 1.0)
    val r = Wilcoxon.signedRank(a, b)
    assert(math.abs(r.pTwoSided - 2.0 / 4096) < 1e-12)
  }

  test("n=5, all positive: p = 0.0625") {
    val a = Seq(2.0, 3.0, 4.0, 5.0, 6.0)
    val b = Seq(1.0, 1.0, 1.0, 1.0, 1.0)
    assert(math.abs(Wilcoxon.signedRank(a, b).pTwoSided - 0.0625) < 1e-12)
  }

  test("statistic bookkeeping: W+ + W- = n(n+1)/2") {
    val a = Seq(1.0, 5.0, 2.0, 8.0, 3.0, 9.0)
    val b = Seq(2.0, 3.0, 4.0, 4.0, 5.0, 1.0)
    val r = Wilcoxon.signedRank(a, b)
    val total = r.n * (r.n + 1) / 2.0
    assert(r.wPlus <= total)
    assert(r.w <= total / 2)
  }

  test("symmetry: swapping the samples keeps the p-value") {
    val a = Seq(1.0, 5.0, 2.0, 8.0, 3.0)
    val b = Seq(2.0, 3.0, 4.0, 4.0, 5.0)
    val p1 = Wilcoxon.signedRank(a, b).pTwoSided
    val p2 = Wilcoxon.signedRank(b, a).pTwoSided
    assert(math.abs(p1 - p2) < 1e-12)
  }

  test("zero differences are dropped") {
    val a = Seq(1.0, 2.0, 3.0, 4.0)
    val b = Seq(1.0, 2.0, 2.0, 3.0)
    assert(Wilcoxon.signedRank(a, b).n == 2)
  }

  test("all-zero differences are rejected") {
    intercept[IllegalArgumentException] { Wilcoxon.signedRank(Seq(1.0, 2.0), Seq(1.0, 2.0)) }
  }

  test("tied magnitudes get mean ranks: balanced case has p = 1") {
    // diffs +1, +1, -1, -1 with equal |d|: perfectly symmetric
    val r = Wilcoxon.signedRank(Seq(2.0, 2.0, 0.0, 0.0), Seq(1.0, 1.0, 1.0, 1.0))
    assert(math.abs(r.pTwoSided - 1.0) < 1e-9)
  }

  test("balanced evidence is insignificant, one-sided evidence significant") {
    val strong = Wilcoxon.signedRank((1 to 10).map(i => i + 1.0), (1 to 10).map(_.toDouble))
    assert(strong.pTwoSided < 0.05)
    val weak = Wilcoxon.signedRank(Seq(2.0, 0.0, 3.0, -1.0), Seq(1.0, 1.0, 1.0, 1.0))
    assert(weak.pTwoSided > 0.05)
  }

  test("p-values always land in (0, 1]") {
    val rng = new scala.util.Random(3)
    for (_ <- 0 until 30) {
      val n = 4 + rng.nextInt(12)
      val a = Seq.fill(n)(rng.nextDouble() * 10)
      val b = Seq.fill(n)(rng.nextDouble() * 10)
      if (a.zip(b).exists { case (x, y) => x != y }) {
        val p = Wilcoxon.signedRank(a, b).pTwoSided
        assert(p > 0.0 && p <= 1.0)
      }
    }
  }

  test("large n uses the normal approximation and stays sane") {
    val a = (1 to 40).map(i => i + (if (i % 3 == 0) 1.0 else -0.4))
    val b = (1 to 40).map(_.toDouble)
    val p = Wilcoxon.signedRank(a, b).pTwoSided
    assert(p > 0.0 && p <= 1.0)
  }

  test("normalCdf matches known quantiles") {
    assert(math.abs(Wilcoxon.normalCdf(0.0) - 0.5) < 1e-7)
    assert(math.abs(Wilcoxon.normalCdf(1.96) - 0.975) < 1e-3)
    assert(math.abs(Wilcoxon.normalCdf(-1.96) - 0.025) < 1e-3)
  }

  test("exact matches normal approximation roughly at the boundary") {
    val a = (1 to 20).map(i => i + (if (i % 2 == 0) 2.0 else -1.0))
    val b = (1 to 20).map(_.toDouble)
    val exact = Wilcoxon.signedRank(a, b).pTwoSided // n=20 <= 25 exact
    assert(exact > 0.0 && exact <= 1.0)
  }
}
