package repro.eval

/** Evaluation metrics from §V of the paper: relative standard error per
  * cardinality, and FNR/FPR for super-spreader detection.
  */
object Metrics {

  /** RSE(n) = sqrt(mean over users with true cardinality n of (n̂−n)²) / n,
    * computed per *bucket* of true cardinalities so sparse large
    * cardinalities still aggregate enough users. `bucketOf` maps a true
    * cardinality to its bucket key (identity reproduces the paper's exact
    * per-n metric; log₂ bucketing is used for the Figure-5-style table).
    *
    * Returns bucket → (representative n = geometric mean of bucket truths,
    * RSE, user count).
    */
  def rseByBucket(
      truth: Array[Int],
      est: Long => Double,
      bucketOf: Int => Int
  ): Map[Int, (Double, Double, Long)] = {
    val sumSq = scala.collection.mutable.Map.empty[Int, Double]
    val sumLogN = scala.collection.mutable.Map.empty[Int, Double]
    val cnt = scala.collection.mutable.Map.empty[Int, Long]
    var u = 0
    while (u < truth.length) {
      val n = truth(u)
      if (n > 0) {
        val b = bucketOf(n)
        val err = est(u.toLong) - n
        // Normalise each user's squared error by its own n² so mixed-n
        // buckets aggregate relative (not absolute) error.
        sumSq(b) = sumSq.getOrElse(b, 0.0) + err * err / (n.toDouble * n)
        sumLogN(b) = sumLogN.getOrElse(b, 0.0) + math.log(n.toDouble)
        cnt(b) = cnt.getOrElse(b, 0L) + 1
      }
      u += 1
    }
    sumSq.keys.map { b =>
      val c = cnt(b)
      b -> (math.exp(sumLogN(b) / c), math.sqrt(sumSq(b) / c), c)
    }.toMap
  }

  /** Power-of-two bucket: cardinalities in [2^k, 2^{k+1}) share bucket k. */
  def log2Bucket(n: Int): Int = 63 - java.lang.Long.numberOfLeadingZeros(n.toLong).toInt

  /** Super-spreader detection (§V-F). A user is a true super spreader when
    * its true cardinality ≥ threshold; it is reported when its estimate ≥
    * threshold. Returns (FNR, FPR, #true spreaders):
    * FNR = missed spreaders / true spreaders;
    * FPR = falsely reported users / all users.
    */
  def superSpreader(
      truth: Array[Int],
      est: Long => Double,
      threshold: Double
  ): (Double, Double, Long) = {
    var trueSp = 0L
    var missed = 0L
    var falsePos = 0L
    var u = 0
    while (u < truth.length) {
      val isTrue = truth(u) >= threshold
      val isPred = est(u.toLong) >= threshold
      if (isTrue) {
        trueSp += 1
        if (!isPred) missed += 1
      } else if (isPred) falsePos += 1
      u += 1
    }
    val fnr = if (trueSp == 0) 0.0 else missed.toDouble / trueSp
    val fpr = falsePos.toDouble / truth.length
    (fnr, fpr, trueSp)
  }
}
