package repro.data

import repro.SparkSpec

class DatasetGenSpec extends SparkSpec {

  test("there are 13 dataset specs matching the paper's Table I identifiers") {
    assert(DatasetGen.specs.size == 13)
    assert(DatasetGen.specs.map(_.id) == (1 to 13).map(i => s"S$i").toVector)
  }

  test("spec metadata matches the paper's Table I") {
    val s7 = DatasetGen.specs(6)
    assert(s7.name == "coil2000" && s7.n == 9822 && s7.p == 85 && s7.q == 2)
    val s11 = DatasetGen.specs(10)
    assert(s11.name == "shuttle" && s11.n == 58000 && s11.q == 7 && s11.ir == 4558.6)
  }

  test("classCounts sums to n for binary classes") {
    val c = DatasetGen.classCounts(1000, 2, 4.0)
    assert(c.sum == 1000)
    assert(math.abs(c(0).toDouble / c(1) - 4.0) < 0.1)
  }

  test("classCounts respects the imbalance ratio for multi-class") {
    val c = DatasetGen.classCounts(10000, 5, 100.0)
    assert(c.sum == 10000)
    val ir = c.max.toDouble / c.min
    assert(ir > 50 && ir < 200, s"measured IR $ir should approximate 100")
  }

  test("classCounts floors tiny classes at 3") {
    val c = DatasetGen.classCounts(3000, 7, 4558.6)
    assert(c.forall(_ >= 3))
  }

  test("generate honors N and p caps") {
    val spec = DatasetGen.specs(10) // shuttle: 58000 x 9
    val d = DatasetGen.generate(spec, maxN = 500, maxP = 4)
    assert(d.size == 500)
    assert(d.head.dim == 4)
  }

  test("generate uses the full size when caps are loose") {
    val spec = DatasetGen.specs(0) // 690 x 15
    val d = DatasetGen.generate(spec, maxN = 100000, maxP = 1000)
    assert(d.size == 690 && d.head.dim == 15)
  }

  test("generated labels cover 0 until q") {
    val spec = DatasetGen.specs(2) // Car Evaluation, q=4
    val d = DatasetGen.generate(spec, maxN = 600)
    assert(d.map(_.label).distinct.sorted == (0 until 4).toVector)
  }

  test("generated ids are unique and sequential after shuffling") {
    val d = DatasetGen.generate(DatasetGen.specs(1), maxN = 300)
    assert(d.map(_.id).sorted == (0L until d.size.toLong).toVector)
  }

  test("generation is deterministic in the seed") {
    val spec = DatasetGen.specs(3)
    val a = DatasetGen.generate(spec, maxN = 200, seed = 5)
    val b = DatasetGen.generate(spec, maxN = 200, seed = 5)
    assert(a.map(_.id) == b.map(_.id))
    assert(a.zip(b).forall { case (x, y) => x.features.sameElements(y.features) })
  }

  test("different seeds give different data") {
    val spec = DatasetGen.specs(3)
    val a = DatasetGen.generate(spec, maxN = 200, seed = 5)
    val b = DatasetGen.generate(spec, maxN = 200, seed = 6)
    assert(!a.zip(b).forall { case (x, y) => x.features.sameElements(y.features) })
  }

  test("categorical-ish columns are quantized") {
    val spec = DatasetGen.specs(2) // all 6 columns categorical
    val d = DatasetGen.generate(spec, maxN = 300)
    spec.catIdx.foreach { c =>
      d.foreach(p => assert((p.features(c) * 2).isWhole,
        s"column $c should be quantized to halves"))
    }
  }

  test("withNoise flips about the requested fraction of labels") {
    val d = DatasetGen.generate(DatasetGen.specs(4), maxN = 1000)
    val noisy = DatasetGen.withNoise(d, 0.2, seed = 1)
    val flipped = d.zip(noisy).count { case (a, b) => a.label != b.label }
    assert(flipped == 200, s"expected exactly 200 flips, got $flipped")
  }

  test("withNoise preserves ids and features") {
    val d = DatasetGen.generate(DatasetGen.specs(4), maxN = 300)
    val noisy = DatasetGen.withNoise(d, 0.3, seed = 2)
    assert(d.map(_.id) == noisy.map(_.id))
    assert(d.zip(noisy).forall { case (a, b) => a.features.sameElements(b.features) })
  }

  test("withNoise at ratio 0 is identity") {
    val d = DatasetGen.generate(DatasetGen.specs(4), maxN = 100)
    assert(DatasetGen.withNoise(d, 0.0) eq d)
  }

  test("noisy labels stay within the label set") {
    val d = DatasetGen.generate(DatasetGen.specs(7), maxN = 400) // 7 classes
    val labels = d.map(_.label).toSet
    val noisy = DatasetGen.withNoise(d, 0.4, seed = 3)
    assert(noisy.map(_.label).toSet.subsetOf(labels))
  }

  test("stratifiedFolds partition the data") {
    val d = DatasetGen.generate(DatasetGen.specs(1), maxN = 500)
    val folds = DatasetGen.stratifiedFolds(d, 5)
    assert(folds.size == 5)
    val testIds = folds.flatMap(_._2.map(_.id)).sorted
    assert(testIds == d.map(_.id).sorted, "test folds must partition the dataset")
    folds.foreach { case (train, test) =>
      assert(train.size + test.size == d.size)
      assert(train.map(_.id).toSet.intersect(test.map(_.id).toSet).isEmpty)
    }
  }

  test("stratifiedFolds keep class proportions approximately") {
    val d = DatasetGen.generate(DatasetGen.specs(9), maxN = 1000) // magic, IR 1.84
    val overall = d.count(_.label == 0).toDouble / d.size
    DatasetGen.stratifiedFolds(d, 5).foreach { case (_, test) =>
      val frac = test.count(_.label == 0).toDouble / test.size
      assert(math.abs(frac - overall) < 0.05)
    }
  }

  test("standardize gives zero mean unit variance on train") {
    val d = DatasetGen.generate(DatasetGen.specs(5), maxN = 400)
    val folds = DatasetGen.stratifiedFolds(d, 4)
    val (tr, te) = DatasetGen.standardize(folds.head._1, folds.head._2)
    val p = tr.head.dim
    for (dim <- 0 until p) {
      val vals = tr.map(_.features(dim))
      val mean = vals.sum / vals.size
      val varr = vals.map(v => (v - mean) * (v - mean)).sum / vals.size
      assert(math.abs(mean) < 1e-9, s"train mean in dim $dim should be 0")
      assert(math.abs(varr - 1.0) < 1e-6, s"train variance in dim $dim should be 1")
    }
    assert(te.size == folds.head._2.size)
  }

  test("measured IR of the generated analog approximates the spec (when not floored)") {
    val spec = DatasetGen.specs(8) // HTRU2, IR 9.92 binary
    val d = DatasetGen.generate(spec, maxN = 2000)
    val counts = d.groupBy(_.label).values.map(_.size)
    val ir = counts.max.toDouble / counts.min
    assert(ir > 7 && ir < 13, s"measured IR $ir should approximate 9.92")
  }
}
