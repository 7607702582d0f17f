package repro

import repro.core.Point
import scala.util.Random

/** Small deterministic datasets shared by the unit suites. */
object TestData {

  /** Build points from (coordinates, label) rows with sequential ids. */
  def pts(rows: (Seq[Double], Int)*): Vector[Point] =
    rows.zipWithIndex.map { case ((x, y), i) => Point(x.toArray, y, i.toLong) }.toVector

  /** 1D points from (x, label) pairs. */
  def pts1d(rows: (Double, Int)*): Vector[Point] =
    rows.zipWithIndex.map { case ((x, y), i) => Point(Array(x), y, i.toLong) }.toVector

  /** Two well-separated Gaussian blobs in `dim` dimensions. */
  def twoBlobs(n: Int, dim: Int = 2, sep: Double = 6.0, seed: Long = 1): Vector[Point] = {
    val rng = new Random(seed)
    val out = Vector.newBuilder[Point]
    var id = 0L
    for (cls <- 0 to 1; _ <- 0 until n / 2) {
      val x = Array.tabulate(dim)(d => (if (d == 0) cls * sep else 0.0) + rng.nextGaussian())
      out += Point(x, cls, id); id += 1
    }
    out.result()
  }

  /** `k` Gaussian blobs, one per class, centers on a circle of radius `sep`. */
  def blobs(k: Int, nPerClass: Int, dim: Int = 2, sep: Double = 8.0, seed: Long = 2): Vector[Point] = {
    val rng = new Random(seed)
    val out = Vector.newBuilder[Point]
    var id = 0L
    for (cls <- 0 until k; _ <- 0 until nPerClass) {
      val angle = 2 * math.Pi * cls / k
      val cx = sep * math.cos(angle); val cy = sep * math.sin(angle)
      val x = Array.tabulate(dim) {
        case 0 => cx + rng.nextGaussian()
        case 1 => cy + rng.nextGaussian()
        case _ => rng.nextGaussian()
      }
      out += Point(x, cls, id); id += 1
    }
    out.result()
  }
}
