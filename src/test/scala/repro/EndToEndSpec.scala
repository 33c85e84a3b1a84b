package repro

import repro.data.Profile
import repro.eval.{Experiments, Metrics}

/** Miniature end-to-end runs of the Table II / Figure 5 pipelines at tiny
  * scale with fixed seeds — the full-scale versions live in `bench/`.
  */
class EndToEndSpec extends SparkSpec {

  test("mini Table II on sanjose replica: five methods, sane metrics") {
    val ds = Experiments.dataset(Profile.sanjose, sigma = 0.001)
    // At 1/1000 scale the paper's Δ = 5e-5 gives a threshold of ~1 item;
    // use Δ = 5e-4 so the mini pipeline has a meaningful threshold.
    val rows = Experiments.tableIIFor(ds, mBits = 200_000L, m = 24, delta = 5e-4)
    assert(rows.map(_.method) == Seq("FreeBS", "FreeRS", "CSE", "vHLL", "HLL++"))
    rows.foreach { r =>
      assert(r.fnr >= 0 && r.fnr <= 1)
      assert(r.fpr >= 0 && r.fpr <= 1)
    }
    val free = rows.filter(_.method.startsWith("Free"))
    free.foreach(r => assert(r.fnr < 0.5, s"${r.method} FNR ${r.fnr}"))
    free.foreach(r => assert(r.fpr < 0.05, s"${r.method} FPR ${r.fpr}"))
  }

  test("CSE range saturation: large cardinalities collapse onto m·ln m") {
    // Orkut-like skew with m = 8 → range cap ≈ 16.6 far below the max card.
    val ds = Experiments.dataset(Profile.orkut, sigma = 0.002)
    val st = ds.stream
    val mBits = 1_000_000L // light bit-array load so FreeBS itself is accurate
    val cse = new baselines.Cse(mBits, 8, seed = 3)
    var i = 0
    while (i < st.length) { cse.update(st.users(i), st.items(i)); i += 1 }
    val cap = 8 * math.log(8.0)
    val big = st.truth.zipWithIndex.filter(_._1 >= 40)
    assert(big.nonEmpty)
    big.foreach { case (_, u) =>
      assert(cse.estimate(u.toLong) <= cap + 1e-9, s"user $u above CSE range cap")
    }
    // FreeBS with the same memory does not collapse: nearly all big users
    // estimate above CSE's cap.
    val fbs = new core.FreeBS(mBits, seed = 3)
    i = 0
    while (i < st.length) { fbs.update(st.users(i), st.items(i)); i += 1 }
    val above = big.count { case (_, u) => fbs.estimate(u.toLong) > cap }
    assert(above >= 0.9 * big.size, s"only $above/${big.size} big users above CSE cap")
  }

  test("accuracy ordering on the top bucket: FreeBS beats range-limited CSE") {
    val ds = Experiments.dataset(Profile.orkut, sigma = 0.002)
    val st = ds.stream
    val cse = new baselines.Cse(100_000L, 8, seed = 5)
    val fbs = new core.FreeBS(100_000L, seed = 5)
    var i = 0
    while (i < st.length) { cse.update(st.users(i), st.items(i)); fbs.update(st.users(i), st.items(i)); i += 1 }
    def topRse(est: Long => Double): Double = {
      val r = Metrics.rseByBucket(st.truth, est, n => if (n >= 32) 1 else 0)
      r(1)._2
    }
    val cseRse = topRse(cse.estimate)
    val fbsRse = topRse(fbs.estimate)
    assert(fbsRse < cseRse, s"FreeBS RSE $fbsRse not below CSE RSE $cseRse on big users")
    assert(cseRse > 0.4, s"CSE should be badly range-limited here, RSE $cseRse")
  }

  test("super-spreader detection degrades gracefully as memory shrinks") {
    val ds = Experiments.dataset(Profile.chicago, sigma = 0.001)
    def fnrAt(mBits: Long): Double = {
      val rows = Experiments.tableIIFor(ds, mBits = mBits, m = 16, seed = 7L)
      rows.find(_.method == "FreeBS").get.fnr
    }
    val rich = fnrAt(500_000L)
    val poor = fnrAt(2_000L)
    assert(rich <= poor + 0.05, s"more memory should not hurt: $rich vs $poor")
  }
}
