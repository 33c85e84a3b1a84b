package repro.eval

import repro.SparkSpec

class MetricsSpec extends SparkSpec {

  test("perfect estimates give zero RSE") {
    val truth = Array(3, 5, 5, 9)
    val res = Metrics.rseByBucket(truth, u => truth(u.toInt).toDouble, identity)
    res.values.foreach { case (_, rse, _) => assert(rse == 0.0) }
  }

  test("RSE of a single user with known error") {
    val truth = Array(10)
    val res = Metrics.rseByBucket(truth, _ => 12.0, identity)
    val (meanN, rse, cnt) = res(10)
    assert(math.abs(meanN - 10.0) < 1e-9 && cnt == 1)
    assert(math.abs(rse - 0.2) < 1e-12) // |12-10|/10
  }

  test("RSE aggregates users of the same cardinality (RMS of relative errors)") {
    val truth = Array(10, 10)
    val est = Map(0L -> 13.0, 1L -> 7.0) // +0.3 and −0.3 relative error
    val res = Metrics.rseByBucket(truth, est, identity)
    val (_, rse, cnt) = res(10)
    assert(cnt == 2)
    assert(math.abs(rse - 0.3) < 1e-12)
  }

  test("users with zero truth are skipped") {
    val truth = Array(0, 5)
    val res = Metrics.rseByBucket(truth, _ => 5.0, identity)
    assert(res.size == 1 && res.contains(5))
  }

  test("bucketing groups mixed cardinalities") {
    val truth = Array(2, 3, 8, 15)
    val res = Metrics.rseByBucket(truth, u => truth(u.toInt).toDouble, Metrics.log2Bucket)
    assert(res.keySet == Set(1, 3)) // [2,4) and [8,16)
    assert(res(1)._3 == 2 && res(3)._3 == 2)
  }

  test("log2Bucket boundary values") {
    assert(Metrics.log2Bucket(1) == 0)
    assert(Metrics.log2Bucket(2) == 1)
    assert(Metrics.log2Bucket(3) == 1)
    assert(Metrics.log2Bucket(4) == 2)
    assert(Metrics.log2Bucket(1023) == 9)
    assert(Metrics.log2Bucket(1024) == 10)
  }

  test("geometric mean of bucket truths is reported") {
    val truth = Array(4, 16)
    val res = Metrics.rseByBucket(truth, u => truth(u.toInt).toDouble, _ => 0)
    assert(math.abs(res(0)._1 - 8.0) < 1e-9) // sqrt(4·16)
  }

  test("superSpreader on a hand-built example") {
    // truth:  [10, 3, 8, 1];  threshold 5 → true spreaders {0, 2}
    // est:    [ 9, 6, 2, 0]   → predicted {0, 1}; missed {2}; false {1}
    val truth = Array(10, 3, 8, 1)
    val est = Map(0L -> 9.0, 1L -> 6.0, 2L -> 2.0, 3L -> 0.0)
    val (fnr, fpr, trueSp) = Metrics.superSpreader(truth, est, 5.0)
    assert(trueSp == 2)
    assert(math.abs(fnr - 0.5) < 1e-12)
    assert(math.abs(fpr - 0.25) < 1e-12)
  }

  test("superSpreader: perfect estimates give zero FNR and FPR") {
    val truth = Array(10, 3, 8, 1)
    val (fnr, fpr, _) = Metrics.superSpreader(truth, u => truth(u.toInt).toDouble, 5.0)
    assert(fnr == 0.0 && fpr == 0.0)
  }

  test("superSpreader with no true spreaders reports FNR 0") {
    val truth = Array(1, 2, 3)
    val (fnr, fpr, trueSp) = Metrics.superSpreader(truth, _ => 100.0, 50.0)
    assert(trueSp == 0 && fnr == 0.0)
    assert(math.abs(fpr - 1.0) < 1e-12) // every user falsely flagged
  }

  test("threshold is inclusive on both sides") {
    val truth = Array(5)
    val (fnr, _, trueSp) = Metrics.superSpreader(truth, _ => 5.0, 5.0)
    assert(trueSp == 1 && fnr == 0.0)
  }
}
