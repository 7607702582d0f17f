package repro.sampling

import repro.core.Point
import repro.{SparkSpec, TestData}

class TomekLinksSpec extends SparkSpec {

  test("a heterogeneous mutual-NN pair is a link") {
    val data = TestData.pts1d((0.0, 0), (0.1, 1), (5.0, 0), (9.0, 0))
    assert(TomekLinks.links(data) == Vector((0, 1)))
  }

  test("homogeneous mutual-NN pairs are not links") {
    val data = TestData.pts1d((0.0, 0), (0.1, 0), (5.0, 1), (5.1, 1))
    assert(TomekLinks.links(data).isEmpty)
  }

  test("non-mutual nearest neighbors are not links") {
    // 1 is nearest to 0, but 0's nearest is 1 — craft a chain: a(0) b(1) c(1)
    // b's NN is c, a's NN is b => (a,b) not mutual.
    val data = TestData.pts1d((0.0, 0), (1.0, 1), (1.5, 1))
    assert(TomekLinks.links(data).isEmpty)
  }

  test("the majority-class member of a link is removed") {
    val data = TestData.pts1d((0.0, 0), (0.1, 1), (5.0, 0), (9.0, 0), (20.0, 1))
    // class 0 is majority (3 vs 2): id 0 removed, id 1 (minority) kept
    val s = TomekLinks.sample(data)
    assert(!s.exists(_.id == 0L))
    assert(s.exists(_.id == 1L))
  }

  test("sampling removes only link members") {
    val data = TestData.pts1d((0.0, 0), (0.1, 1), (5.0, 0), (9.0, 0), (20.0, 1))
    val s = TomekLinks.sample(data)
    assert(s.size == data.size - 1)
  }

  test("clean separated data loses nothing") {
    val data = TestData.twoBlobs(60, sep = 20.0, seed = 1)
    assert(TomekLinks.sample(data).size == data.size)
  }

  test("noisy boundaries produce links and removals") {
    val data = TestData.twoBlobs(100, sep = 1.0, seed = 2)
    val s = TomekLinks.sample(data)
    assert(s.size < data.size, "overlapping classes must produce Tomek links")
  }

  test("minority samples survive sampling") {
    val maj = (0 until 20).map(i => Point(Array(i * 0.1), 0, i.toLong))
    val min = (0 until 5).map(i => Point(Array(i * 0.1 + 0.05), 1, (100 + i).toLong))
    val data = (maj ++ min).toVector
    val s = TomekLinks.sample(data)
    assert(s.count(_.label == 1) == 5, "minority class members are never removed")
  }

  test("empty and single-class inputs are identity") {
    assert(TomekLinks.sample(Vector.empty).isEmpty)
    val one = TestData.pts1d((0.0, 0), (1.0, 0))
    assert(TomekLinks.sample(one) == one)
  }
}
