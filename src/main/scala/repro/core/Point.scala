package repro.core

/** A labeled sample: feature vector, integer class label, and a stable id.
  *
  * The id is assigned once per dataset and survives sampling, so tests can
  * verify sampled ⊆ original by id and dedup borderline samples exactly.
  */
final case class Point(features: Array[Double], label: Int, id: Long) extends Serializable {
  /** Number of features. */
  def dim: Int = features.length

  /** Squared Euclidean distance to another point (no sqrt — monotone). */
  def sqDist(other: Point): Double = Point.sqDist(features, other.features)

  /** Euclidean distance to another point. */
  def dist(other: Point): Double = math.sqrt(sqDist(other))

  /** Euclidean distance to a raw coordinate vector. */
  def distTo(coords: Array[Double]): Double = math.sqrt(Point.sqDist(features, coords))

  override def equals(o: Any): Boolean = o match {
    case p: Point => p.id == id
    case _        => false
  }
  override def hashCode(): Int = java.lang.Long.hashCode(id)
  override def toString: String =
    s"Point(id=$id, label=$label, x=[${features.take(4).map(v => f"$v%.3f").mkString(",")}${if (dim > 4) ",…" else ""}])"
}

object Point {
  /** Squared Euclidean distance between two coordinate vectors. */
  def sqDist(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dimension mismatch: ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    s
  }

  /** Euclidean distance between two coordinate vectors. */
  def dist(a: Array[Double], b: Array[Double]): Double = math.sqrt(sqDist(a, b))

  /** Build points from raw rows, assigning sequential ids. */
  def fromRows(rows: Seq[(Array[Double], Int)]): Vector[Point] =
    rows.zipWithIndex.map { case ((x, y), i) => Point(x, y, i.toLong) }.toVector
}
