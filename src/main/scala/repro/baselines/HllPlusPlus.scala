package repro.baselines

import repro.core.{Hashing, RegisterArray, UserCardinalitySketch}
import scala.collection.mutable

/** HLL++ — per-user HyperLogLog with 6-bit registers (Heule et al.), as
  * benchmarked by the paper with `m = M / (6·|S|)` registers per user under
  * a total budget of M bits.
  *
  * DESIGN.md §5.2: the empirically-trained bias table and sparse encoding
  * of the original HLL++ are substituted by the 64-bit hash + 6-bit
  * registers + linear-counting small-range switch, which reproduce the
  * behaviour the paper's comparison relies on.
  */
final class HllPlusPlus(val m: Int, val seed: Long = 53L) extends UserCardinalitySketch {
  require(m >= 2, s"HLL++ needs at least 2 registers per user, got $m")

  val width = 6

  private val sketches = mutable.LongMap.empty[RegisterArray]
  private val counters = mutable.LongMap.empty[Double]

  override def name: String = "HLL++"

  private def sketchOf(s: Long): RegisterArray =
    sketches.getOrElseUpdate(s, new RegisterArray(m, width))

  override def update(s: Long, d: Long): Unit = {
    val regs = sketchOf(s)
    val pos = Hashing.itemIndex(d, m.toLong, seed).toInt
    val r = Hashing.rank(d, regs.maxValue, seed)
    regs.update(pos, r)
    counters(s) = estimateFrom(regs)
  }

  // O(m) register enumeration per estimate, the cost model of §V-D (the
  // incremental sums exist on RegisterArray, but the paper's baselines scan).
  private def estimateFrom(regs: RegisterArray): Double = {
    var sum = 0.0
    var zeros = 0
    var i = 0
    while (i < m) {
      val r = regs.get(i)
      sum += Hll.pow2Neg(r)
      if (r == 0) zeros += 1
      i += 1
    }
    Hll.estimate(m, sum, zeros)
  }

  /** Recompute the estimate of `s` from its current registers (O(m)). */
  def estimateNow(s: Long): Double = sketches.get(s).map(estimateFrom).getOrElse(0.0)

  override def estimate(s: Long): Double = counters.getOrElse(s, 0.0)

  /** Total memory across all allocated per-user sketches. */
  override def memoryBits: Long = sketches.size.toLong * m * width
}
