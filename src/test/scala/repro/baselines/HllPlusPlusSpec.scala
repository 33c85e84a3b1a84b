package repro.baselines

import repro.SparkSpec

class HllPlusPlusSpec extends SparkSpec {

  private def feed(sk: HllPlusPlus, s: Long, n: Int, base: Long = 0L): Unit =
    (0 until n).foreach(j => sk.update(s, base + j))

  test("unseen user estimates 0") {
    assert(new HllPlusPlus(64).estimate(1L) == 0.0)
  }

  test("small cardinalities accurate via linear counting") {
    val sk = new HllPlusPlus(64, seed = 3)
    feed(sk, 1L, 10)
    assert(math.abs(sk.estimate(1L) - 10) < 4, s"estimate ${sk.estimate(1L)}")
  }

  test("medium cardinality within 25% (m = 64 → σ ≈ 13%)") {
    val sk = new HllPlusPlus(64, seed = 5)
    feed(sk, 1L, 2000)
    val est = sk.estimate(1L)
    assert(math.abs(est - 2000) < 500, s"estimate $est vs 2000")
  }

  test("duplicates ignored") {
    val sk = new HllPlusPlus(64, seed = 7)
    feed(sk, 1L, 300)
    val before = sk.estimate(1L)
    feed(sk, 1L, 300)
    assert(sk.estimate(1L) == before)
  }

  test("users get independent sketches") {
    val sk = new HllPlusPlus(64, seed = 9)
    feed(sk, 1L, 20, base = 0)
    feed(sk, 2L, 100000, base = 1 << 20)
    assert(math.abs(sk.estimate(1L) - 20) < 8, s"user1 ${sk.estimate(1L)}")
  }

  test("6-bit registers: width and memory accounting") {
    val sk = new HllPlusPlus(32)
    assert(sk.width == 6)
    feed(sk, 1L, 5); feed(sk, 2L, 5)
    assert(sk.memoryBits == 2L * 32 * 6)
  }

  test("tracked counter equals a fresh estimate for per-user sketches") {
    val sk = new HllPlusPlus(64, seed = 11)
    feed(sk, 1L, 500)
    assert(sk.estimate(1L) == sk.estimateNow(1L))
  }

  test("tiny m = 2 (the paper's Twitter setting) stays finite") {
    val sk = new HllPlusPlus(2, seed = 13)
    feed(sk, 1L, 1000)
    assert(sk.estimate(1L).isFinite && sk.estimate(1L) > 0)
  }

  test("rejects m < 2") {
    intercept[IllegalArgumentException](new HllPlusPlus(1))
  }

  test("deterministic per seed") {
    def run(seed: Long): Double = {
      val sk = new HllPlusPlus(32, seed)
      feed(sk, 1L, 200)
      sk.estimate(1L)
    }
    assert(run(5) == run(5))
    assert(run(5) != run(6))
  }

  test("estimateNow of an unseen user is 0") {
    assert(new HllPlusPlus(16).estimateNow(3L) == 0.0)
  }
}
