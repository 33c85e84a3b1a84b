package repro.baselines

/** HyperLogLog estimator math shared by HLL++, vHLL and the SQL aggregate.
  *
  * `alpha(m)` follows the paper's constants: tabulated values at
  * m ∈ {16, 32, 64} and `0.7213/(1 + 1.079/m)` for m ≥ 128; other m fall
  * back to the closed form (DESIGN.md §5.3 — within ~2% of the tabulated
  * values, and the linear-counting switch dominates the small-range regime
  * where the difference would matter).
  */
object Hll {

  /** Lookup table of 2^-k for k in [0, 63] — the O(m) estimate scans call
    * this in their inner loop, where `math.pow` would dominate runtime.
    */
  val pow2Neg: Array[Double] = Array.tabulate(64)(k => math.pow(2.0, -k))

  /** Bias-correction constant α_m. */
  def alpha(m: Int): Double = {
    require(m >= 2, s"HLL needs at least 2 registers, got $m")
    m match {
      case 16 => 0.673
      case 32 => 0.697
      case 64 => 0.709
      case _  => 0.7213 / (1.0 + 1.079 / m)
    }
  }

  /** Raw HLL estimate `α_m m² / Σ 2^-R[i]` from the register sum. */
  def rawEstimate(m: Int, sumPow2Neg: Double): Double =
    alpha(m) * m.toDouble * m.toDouble / sumPow2Neg

  /** Full HLL estimate with the small-range linear-counting switch used by
    * the paper: when the raw estimate is below 2.5·m, the registers are read
    * as an LPC bitmap of m bits with `zeroRegs` zeros.
    */
  def estimate(m: Int, sumPow2Neg: Double, zeroRegs: => Int): Double = {
    val raw = rawEstimate(m, sumPow2Neg)
    if (raw < 2.5 * m) {
      val z = zeroRegs
      if (z > 0) m * math.log(m.toDouble / z) else raw
    } else raw
  }

  /** Estimate straight from a raw register byte-array (used by the Spark
    * `Aggregator`, whose buffer is a plain `Array[Byte]`).
    */
  def estimateFromRegisters(regs: Array[Byte]): Double = {
    val m = regs.length
    var sum = 0.0
    var zeros = 0
    var i = 0
    while (i < m) {
      val r = regs(i).toInt
      sum += pow2Neg(r)
      if (r == 0) zeros += 1
      i += 1
    }
    estimate(m, sum, zeros)
  }
}
