package repro.sampling

import repro.core.Point
import scala.util.Random

/** Simple Random Sampling — the unbiased general baseline.
  *
  * The experiment harness matches its ratio to GBABS's measured ratio on
  * the same training fold, as the paper does.
  */
object SRS {

  /** Sample `ratio * |data|` points uniformly without replacement. */
  def sample(data: Vector[Point], ratio: Double, seed: Long = 42): Vector[Point] = {
    require(ratio >= 0.0 && ratio <= 1.0, s"ratio must be in [0,1], got $ratio")
    val k = math.min(data.size, math.round(ratio * data.size).toInt)
    new Random(seed).shuffle(data).take(k)
  }
}
