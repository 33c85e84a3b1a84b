package repro.bench

import repro.SparkSpec
import repro.data.Profile
import repro.eval.Experiments

/** Table II of the paper — super-spreader detection over all six datasets.
  *
  * Paper setup: Δ = 5e-5, M = 5e8 bits, m = 1024. Here (DESIGN.md §4):
  * Δ = 5e-5, M = 5e6 bits, m = 24 on the 1/100 replicas — m is rescaled so
  * the range condition Δ·n > m·ln m singles out exactly Twitter and Orkut,
  * the two datasets where the paper reports CSE as "N/A".
  * Paper numbers are recorded next to these in EXPERIMENTS.md.
  */
class TableIIBench extends SparkSpec {

  private lazy val rows = Experiments.tableII()

  test("Table II: FNR/FPR of the five methods on all six replicas") {
    println()
    println(s"===== Table II (Delta=${Experiments.Delta}, M=${Experiments.DefaultMBits} bits, " +
      s"m=${Experiments.DefaultVirtualM}, sigma=1/100) =====")
    println(Experiments.renderTableII(rows))
    assert(rows.size == Profile.all.size * 5)
    rows.foreach { r =>
      assert(r.fnr >= 0 && r.fnr <= 1, s"${r.dataset}/${r.method} FNR")
      assert(r.fpr >= 0 && r.fpr <= 1, s"${r.dataset}/${r.method} FPR")
    }
  }

  test("Table II shape: CSE is range-limited to N/A on exactly Twitter and Orkut") {
    val cse = rows.filter(_.method == "CSE")
    val naOn = cse.filter(_.na).map(_.dataset).toSet
    assert(naOn == Set("Twitter", "Orkut"), s"CSE N/A on $naOn")
  }

  test("Table II shape: Free* beats every applicable baseline on FNR, per dataset") {
    // The reproduced ranking claim: on every dataset the better of
    // FreeBS/FreeRS has a lower FNR than the best non-N/A baseline. (The
    // paper's two Free* columns also track each other closely, with either
    // one occasionally ahead.)
    Profile.all.map(_.name).foreach { ds =>
      val here = rows.filter(_.dataset == ds)
      val free = here.filter(_.method.startsWith("Free")).map(_.fnr).min
      val base = here.filter(r => !r.method.startsWith("Free") && !r.na).map(_.fnr).min
      assert(free <= base, s"$ds: best Free* FNR $free above best baseline $base")
    }
  }

  test("Table II shape: Free* beats every applicable baseline on FPR, per dataset") {
    Profile.all.map(_.name).foreach { ds =>
      val here = rows.filter(_.dataset == ds)
      val free = here.filter(_.method.startsWith("Free")).map(_.fpr).min
      val base = here.filter(r => !r.method.startsWith("Free") && !r.na).map(_.fpr).min
      assert(free <= base, s"$ds: best Free* FPR $free above best baseline $base")
    }
  }

  test("Table II shape: the Free* advantage is a multiple, not a rounding error") {
    // Paper: "FNR and FPR for FreeBS and FreeRS are about 4 to 20 times
    // smaller" (on sanjose, at m = 1024). At our rescaled m = 24 the
    // baselines are less noisy, so check a ≥2x geometric-mean FNR advantage
    // across datasets (best Free* vs best baseline).
    val ratios = Profile.all.map(_.name).flatMap { ds =>
      val here = rows.filter(_.dataset == ds)
      val free = here.filter(_.method.startsWith("Free")).map(_.fnr).min
      val base = here.filter(r => !r.method.startsWith("Free") && !r.na).map(_.fnr).min
      if (free > 0) Some(base / free) else None
    }
    val geo = math.exp(ratios.map(math.log).sum / ratios.size)
    println(f"Free* FNR advantage (geometric mean over datasets): ${geo}%.1fx")
    assert(geo >= 2.0, s"advantage only ${geo}x")
  }
}
