package repro.baselines

import repro.core.{BitArray, Hashing, UserCardinalitySketch}
import scala.collection.mutable

/** LPC — Linear-Time Probabilistic Counting (Whang et al.), one m-bit
  * sketch per user, as benchmarked by the paper with `m = M / |S|` bits per
  * user under a total budget of M bits.
  *
  * Estimator: `-m · ln(U_s/m)` with `U_s` the user's zero-bit count, capped
  * at the range limit `m·ln m` when the bitmap saturates. Following §V-B,
  * each arrival refreshes only the arriving user's counter; the zero count
  * is obtained by scanning the bitmap, the O(m) cost the paper attributes
  * to LPC (§V-D measures exactly this enumeration).
  */
final class Lpc(val m: Int, val seed: Long = 41L) extends UserCardinalitySketch {
  require(m > 0, s"LPC needs a positive per-user sketch size, got $m")

  private val sketches = mutable.LongMap.empty[BitArray]
  private val counters = mutable.LongMap.empty[Double]

  override def name: String = "LPC"

  private def sketchOf(s: Long): BitArray =
    sketches.getOrElseUpdate(s, new BitArray(m.toLong))

  override def update(s: Long, d: Long): Unit = {
    val b = sketchOf(s)
    b.set(Hashing.itemIndex(d, m.toLong, seed))
    counters(s) = estimateFrom(b)
  }

  private def estimateFrom(b: BitArray): Double = {
    val u = b.recountZeros() // O(m) bitmap enumeration, as in the paper
    if (u == 0) m * math.log(m.toDouble) // saturated: range cap m·ln m
    else -m * math.log(u.toDouble / m)
  }

  /** Recompute the estimate of `s` from its current bitmap (O(m) scan). */
  def estimateNow(s: Long): Double = sketches.get(s).map(estimateFrom).getOrElse(0.0)

  override def estimate(s: Long): Double = counters.getOrElse(s, 0.0)

  /** Total memory across all allocated per-user sketches. */
  override def memoryBits: Long = sketches.size.toLong * m
}
