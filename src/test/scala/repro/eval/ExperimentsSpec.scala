package repro.eval

import repro.SparkSpec
import repro.data.Profile

class ExperimentsSpec extends SparkSpec {

  private val sigmaTiny = 0.001

  test("tableI rows carry both measured stats and targets") {
    val rows = Experiments.tableI(sigma = sigmaTiny)
    assert(rows.map(_.name) == Profile.all.map(_.name))
    rows.foreach { r =>
      assert(r.users == r.targetUsers, s"${r.name} users")
      assert(r.maxCard == r.targetMax, s"${r.name} maxCard")
      assert(math.abs(r.totalCard - r.targetTotal).toDouble / r.targetTotal < 0.05,
        s"${r.name} total ${r.totalCard} vs ${r.targetTotal}")
    }
  }

  test("renderTableI mentions every dataset") {
    val s = Experiments.renderTableI(Experiments.tableI(sigma = sigmaTiny))
    Profile.all.foreach(p => assert(s.contains(p.name)))
  }

  test("tableIISketches builds the five methods with the right budgets") {
    val sks = Experiments.tableIISketches(100000L, 24, 1000, 3L)
    assert(sks.map(_.name) == Seq("FreeBS", "FreeRS", "CSE", "vHLL", "HLL++"))
    assert(sks(0).memoryBits == 100000L) // FreeBS: all bits
    assert(sks(1).memoryBits == (100000L / 5) * 5) // FreeRS: M/5 regs × 5 bits
    assert(sks(2).memoryBits == 100000L) // CSE: all bits
    assert(sks(3).memoryBits == (100000L / 5) * 5)
  }

  test("HLL++ per-user registers follow M/(6·|S|) with a floor of 2") {
    val sks = Experiments.tableIISketches(120000L, 24, 1000, 3L)
    val hllpp = sks.last.asInstanceOf[repro.baselines.HllPlusPlus]
    assert(hllpp.m == 20) // 120000/(6·1000)
    val floor = Experiments.tableIISketches(1200L, 4, 1000, 3L).last
      .asInstanceOf[repro.baselines.HllPlusPlus]
    assert(floor.m == 2)
  }

  test("tableIIFor on the chicago replica produces well-formed rows") {
    val ds = Experiments.dataset(Profile.chicago, sigma = sigmaTiny)
    val rows = Experiments.tableIIFor(ds, mBits = 50_000L, m = 24)
    assert(rows.length == 5)
    rows.foreach { r =>
      assert(r.dataset == "chicago")
      assert(r.fnr >= 0 && r.fnr <= 1, s"${r.method} fnr ${r.fnr}")
      assert(r.fpr >= 0 && r.fpr <= 1, s"${r.method} fpr ${r.fpr}")
      assert(r.trueSpreaders > 0)
    }
  }

  test("Free* methods detect most super spreaders at tiny scale") {
    val ds = Experiments.dataset(Profile.chicago, sigma = sigmaTiny)
    val rows = Experiments.tableIIFor(ds, mBits = 50_000L, m = 24)
    val free = rows.filter(r => r.method.startsWith("Free"))
    free.foreach(r => assert(r.fnr < 0.5, s"${r.method} fnr ${r.fnr}"))
    free.foreach(r => assert(r.fpr < 0.1, s"${r.method} fpr ${r.fpr}"))
  }

  test("renderTableII prints N/A for a saturated-range method") {
    val rows = Seq(
      Experiments.TableIIRow("x", "CSE", 1.0, 0.0, 10, reportedNone = true),
      Experiments.TableIIRow("x", "FreeBS", 0.1, 0.001, 10, reportedNone = false),
    )
    val s = Experiments.renderTableII(rows)
    assert(s.contains("N/A"))
    assert(s.contains("FreeBS"))
  }

  test("runtimeTable produces positive timings for all six methods") {
    val rows = Experiments.runtimeTable(ms = Seq(16), profile = Profile.flickr,
      sigma = 0.0005, mBits = 50_000L)
    assert(rows.map(_.method).distinct.size == 6)
    rows.foreach(r => assert(r.nsPerUpdate > 0, s"${r.method} timing"))
  }

  test("accuracyTable covers all six methods with finite RSEs") {
    val rows = Experiments.accuracyTable(Profile.flickr, sigma = 0.0005, mBits = 50_000L, m = 16)
    assert(rows.map(_.method).distinct.size == 6)
    rows.foreach(r => assert(r.rse >= 0 && r.rse.isFinite, s"${r.method} rse ${r.rse}"))
    rows.foreach(r => assert(r.users > 0))
  }

  test("mSweep returns one row per (method, m)") {
    val rows = Experiments.mSweep(ms = Seq(16, 64), profile = Profile.flickr,
      sigma = 0.0005, mBits = 50_000L)
    assert(rows.size == 4)
    assert(rows.map(_.method).distinct.toSet == Set("CSE", "vHLL"))
  }

  test("renderers produce non-empty output") {
    val rt = Experiments.runtimeTable(ms = Seq(16), profile = Profile.flickr,
      sigma = 0.0005, mBits = 50_000L)
    assert(Experiments.renderRuntime(rt).contains("FreeBS"))
    val acc = Experiments.accuracyTable(Profile.flickr, sigma = 0.0005, mBits = 50_000L, m = 16)
    assert(Experiments.renderAccuracy(acc).contains("vHLL"))
    val sw = Experiments.mSweep(ms = Seq(16), profile = Profile.flickr,
      sigma = 0.0005, mBits = 50_000L)
    assert(Experiments.renderSweep(sw).contains("CSE"))
  }
}
