package repro.sampling

import repro.core.Point
import repro.SparkSpec
import scala.util.Random

class SmoteSpec extends SparkSpec {

  /** nMaj majority (label 0) around origin, nMin minority (label 1) around (8,0). */
  private def imb(nMaj: Int, nMin: Int, seed: Long): Vector[Point] = {
    val rng = new Random(seed)
    val b = Vector.newBuilder[Point]
    var id = 0L
    for (_ <- 0 until nMaj) { b += Point(Array(rng.nextGaussian(), rng.nextGaussian()), 0, id); id += 1 }
    for (_ <- 0 until nMin) { b += Point(Array(8 + rng.nextGaussian(), rng.nextGaussian()), 1, id); id += 1 }
    b.result()
  }

  test("SMOTE balances class counts exactly") {
    val data = imb(30, 10, 1)
    val s = Smote.smote(data, seed = 2)
    val counts = s.groupBy(_.label).view.mapValues(_.size).toMap
    assert(counts(0) == 30 && counts(1) == 30)
  }

  test("SMOTE keeps all original samples") {
    val data = imb(25, 8, 3)
    val s = Smote.smote(data, seed = 4)
    assert(data.map(_.id).toSet.subsetOf(s.map(_.id).toSet))
  }

  test("SMOTE synthetic ids are fresh") {
    val data = imb(20, 5, 5)
    val s = Smote.smote(data, seed = 6)
    assert(s.map(_.id).distinct.size == s.size)
    val maxOrig = data.map(_.id).max
    assert(s.filterNot(p => data.map(_.id).contains(p.id)).forall(_.id > maxOrig))
  }

  test("SMOTE synthetics lie within the minority bounding box") {
    val data = imb(40, 12, 7)
    val s = Smote.smote(data, seed = 8)
    val minority = data.filter(_.label == 1)
    val lo = Array.tabulate(2)(d => minority.map(_.features(d)).min)
    val hi = Array.tabulate(2)(d => minority.map(_.features(d)).max)
    val synth = s.drop(data.size)
    assert(synth.nonEmpty)
    synth.foreach { p =>
      for (d <- 0 until 2)
        assert(p.features(d) >= lo(d) - 1e-9 && p.features(d) <= hi(d) + 1e-9,
          s"synthetic outside minority hull in dim $d")
    }
  }

  test("SMOTE synthetics carry the minority label") {
    val data = imb(20, 6, 9)
    val s = Smote.smote(data, seed = 10)
    assert(s.drop(data.size).forall(_.label == 1))
  }

  test("SMOTE with a lone minority sample duplicates it") {
    val data = imb(10, 1, 11)
    val s = Smote.smote(data, seed = 12)
    val minority = s.filter(_.label == 1)
    assert(minority.size == 10)
    assert(minority.forall(_.features.sameElements(minority.head.features)))
  }

  test("SMOTE leaves balanced data untouched") {
    val data = imb(15, 15, 13)
    assert(Smote.smote(data, seed = 14).size == data.size)
  }

  test("SMOTE on single-class data is identity") {
    val data = imb(10, 0, 15)
    assert(Smote.smote(data, seed = 16) == data)
  }

  test("multi-class SMOTE balances every class to the majority count") {
    val rng = new Random(17)
    var id = 0L
    val data = (for {
      (cls, n, cx) <- Seq((0, 30, 0.0), (1, 10, 8.0), (2, 5, -8.0))
      _ <- 0 until n
    } yield { val p = Point(Array(cx + rng.nextGaussian(), rng.nextGaussian()), cls, id); id += 1; p }).toVector
    val s = Smote.smote(data, seed = 18)
    val counts = s.groupBy(_.label).view.mapValues(_.size).toMap
    assert(counts == Map(0 -> 30, 1 -> 30, 2 -> 30))
  }

  test("DANGER set: interior minority samples are not DANGER") {
    val data = imb(30, 15, 19) // well separated: minority interior
    val danger = Smote.dangerSet(data, 1)
    assert(danger.size < 15)
  }

  test("DANGER set: boundary minority samples are DANGER") {
    // Minority point with exactly 3 of 5 NNs heterogeneous.
    val data = Vector(
      Point(Array(0.0), 1, 0),  // the candidate
      Point(Array(0.1), 0, 1), Point(Array(-0.1), 0, 2), Point(Array(0.2), 0, 3),
      Point(Array(-0.2), 1, 4), Point(Array(0.3), 1, 5),
      Point(Array(5.0), 1, 6))
    val danger = Smote.dangerSet(data, 1)
    assert(danger.exists(_.id == 0L))
  }

  test("DANGER set: fully surrounded (noise-like) minority samples are excluded") {
    val data = Vector(
      Point(Array(0.0), 1, 0),
      Point(Array(0.1), 0, 1), Point(Array(-0.1), 0, 2), Point(Array(0.2), 0, 3),
      Point(Array(-0.2), 0, 4), Point(Array(0.3), 0, 5),
      Point(Array(9.0), 1, 6), Point(Array(9.1), 1, 7))
    val danger = Smote.dangerSet(data, 1)
    assert(!danger.exists(_.id == 0L), "all-heterogeneous neighborhoods mean noise, not DANGER")
  }

  test("Borderline-SMOTE balances counts like SMOTE") {
    val data = imb(40, 10, 20)
    val s = Smote.borderlineSmote(data, seed = 21)
    val counts = s.groupBy(_.label).view.mapValues(_.size).toMap
    assert(counts(0) == 40 && counts(1) == 40)
  }

  test("SMOTENC keeps categorical columns within the observed value set") {
    val rng = new Random(22)
    var id = 0L
    val data = (for (_ <- 0 until 30) yield {
      val cat = rng.nextInt(3).toDouble
      val p = Point(Array(rng.nextGaussian(), cat), 0, id); id += 1; p
    }).toVector ++ (for (_ <- 0 until 8) yield {
      val cat = (3 + rng.nextInt(2)).toDouble
      val p = Point(Array(8 + rng.nextGaussian(), cat), 1, id); id += 1; p
    }).toVector
    val s = Smote.smoteNC(data, categoricalIdx = Set(1), seed = 23)
    val catValues = data.filter(_.label == 1).map(_.features(1)).toSet
    s.drop(data.size).foreach(p => assert(catValues.contains(p.features(1)),
      s"categorical value ${p.features(1)} was interpolated, not voted"))
  }

  test("SMOTENC with no categorical columns behaves like SMOTE in counts") {
    val data = imb(25, 10, 24)
    val a = Smote.smoteNC(data, Set.empty, seed = 25)
    val counts = a.groupBy(_.label).view.mapValues(_.size).toMap
    assert(counts(0) == 25 && counts(1) == 25)
  }

  test("oversampling determinism in the seed") {
    val data = imb(30, 10, 26)
    def sig(v: Vector[Point]) = v.map(p => (p.id, p.features.toSeq))
    assert(sig(Smote.smote(data, seed = 27)) == sig(Smote.smote(data, seed = 27)))
    assert(sig(Smote.borderlineSmote(data, seed = 27)) == sig(Smote.borderlineSmote(data, seed = 27)))
  }
}
