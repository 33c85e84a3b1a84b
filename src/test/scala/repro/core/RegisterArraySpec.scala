package repro.core

import repro.SparkSpec

class RegisterArraySpec extends SparkSpec {

  test("fresh array is all zero with sum = size") {
    val r = new RegisterArray(100, 5)
    assert(r.get(0) == 0 && r.get(99) == 0)
    assert(r.sumPow2Neg == 100.0)
    assert(r.countZero == 100)
  }

  test("update takes the max and reports growth") {
    val r = new RegisterArray(10, 5)
    assert(r.update(3, 4))
    assert(r.get(3) == 4)
    assert(!r.update(3, 2)) // smaller rank: no change
    assert(r.get(3) == 4)
    assert(r.update(3, 7))
    assert(r.get(3) == 7)
  }

  test("equal rank does not count as growth") {
    val r = new RegisterArray(10, 5)
    assert(r.update(0, 3))
    assert(!r.update(0, 3))
  }

  test("width-5 registers clamp at 31") {
    val r = new RegisterArray(4, 5)
    assert(r.maxValue == 31)
    assert(r.update(0, 100))
    assert(r.get(0) == 31)
  }

  test("width-6 registers clamp at 63") {
    val r = new RegisterArray(4, 6)
    assert(r.maxValue == 63)
    r.update(1, 64)
    assert(r.get(1) == 63)
  }

  test("incremental sum matches a full recompute exactly (width 5)") {
    val r = new RegisterArray(512, 5)
    val rng = new java.util.SplittableRandom(11)
    (0 until 10000).foreach { _ =>
      r.update(rng.nextInt(512), rng.nextInt(35))
    }
    // Multiples of 2^-31 summed over <= 2^9 registers: exact in a Double.
    assert(r.sumPow2Neg == r.recomputeSumPow2Neg)
  }

  test("countZero tracks the number of untouched registers") {
    val r = new RegisterArray(16, 5)
    r.update(2, 1); r.update(9, 5); r.update(2, 3)
    assert(r.countZero == 14)
  }

  test("incremental zero count matches the scan under random load") {
    val r = new RegisterArray(128, 5)
    val rng = new java.util.SplittableRandom(19)
    (0 until 3000).foreach(_ => r.update(rng.nextInt(128), rng.nextInt(8)))
    assert(r.zeros == r.countZero)
  }

  test("rank 0 never changes anything") {
    val r = new RegisterArray(8, 5)
    assert(!r.update(5, 0))
    assert(r.sumPow2Neg == 8.0)
  }

  test("out-of-range and invalid arguments throw") {
    val r = new RegisterArray(8, 5)
    intercept[IllegalArgumentException](r.get(8))
    intercept[IllegalArgumentException](r.update(-1, 3))
    intercept[IllegalArgumentException](r.update(0, -2))
    intercept[IllegalArgumentException](new RegisterArray(0, 5))
    intercept[IllegalArgumentException](new RegisterArray(8, 7))
    intercept[IllegalArgumentException](new RegisterArray(8, 0))
  }

  test("snapshot is a defensive copy") {
    val r = new RegisterArray(8, 5)
    r.update(1, 9)
    val s = r.snapshot
    s(1) = 0
    assert(r.get(1) == 9)
  }

  test("memoryBits = size × width") {
    assert(new RegisterArray(100, 5).memoryBits == 500)
    assert(new RegisterArray(7, 6).memoryBits == 42)
  }

  test("sum decreases monotonically under growth updates") {
    val r = new RegisterArray(32, 5)
    var last = r.sumPow2Neg
    val rng = new java.util.SplittableRandom(3)
    (0 until 200).foreach { _ =>
      r.update(rng.nextInt(32), rng.nextInt(20))
      assert(r.sumPow2Neg <= last + 1e-12)
      last = r.sumPow2Neg
    }
  }
}
