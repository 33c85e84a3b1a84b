package repro.baselines

import repro.core.{BitArray, Hashing, UserCardinalitySketch}
import scala.collection.mutable

/** CSE — Compact Spread Estimator (Yoon et al.), the bit-sharing baseline.
  *
  * A shared bit array `A` of `bigM` bits; user s's *virtual* LPC sketch is
  * the m bits `A[f_1(s)], …, A[f_m(s)]`. Edge (s, d) sets `A[f_{h(d)}(s)]`.
  * Estimator (noise-corrected LPC):
  *
  *   n̂_s = −m·ln(Û_s/m) + m·ln(U/bigM)
  *
  * with Û_s the zero count among the user's virtual bits and U the global
  * zero count. When the virtual sketch saturates (Û_s = 0) the estimate is
  * capped at the range limit `m·ln m`; negative estimates (noise term
  * exceeding the raw term for tiny users) are clamped to 0. Per §V-B each
  * arrival refreshes only the arriving user's counter, costing O(m).
  */
final class Cse(val bigM: Long, val m: Int, val seed: Long = 67L)
    extends UserCardinalitySketch {
  require(bigM > 0, s"CSE needs a positive shared array size, got $bigM")
  require(m > 0 && m <= bigM, s"CSE virtual size m=$m must be in (0, $bigM]")

  val array = new BitArray(bigM)
  private val counters = mutable.LongMap.empty[Double]

  override def name: String = "CSE"

  override def update(s: Long, d: Long): Unit = {
    val j = Hashing.itemIndex(d, m.toLong, seed).toInt
    array.set(Hashing.userSelect(s, j, bigM, seed))
    counters(s) = estimateNow(s)
  }

  /** Recompute the estimate of `s` from the shared array (O(m) scan). */
  def estimateNow(s: Long): Double = {
    var zerosVirtual = 0
    var i = 0
    while (i < m) {
      if (!array.get(Hashing.userSelect(s, i, bigM, seed))) zerosVirtual += 1
      i += 1
    }
    if (zerosVirtual == 0) m * math.log(m.toDouble) // saturated: range cap m·ln m
    else {
      val raw = -m * math.log(zerosVirtual.toDouble / m)
      val noise = -m * math.log(array.zeros.toDouble / bigM)
      math.max(0.0, raw - noise)
    }
  }

  override def estimate(s: Long): Double = counters.getOrElse(s, 0.0)

  override def memoryBits: Long = array.memoryBits
}
