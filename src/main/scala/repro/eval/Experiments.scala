package repro.eval

import repro.baselines.{Cse, HllPlusPlus, Lpc, Vhll}
import repro.core.{FreeBS, FreeRS, UserCardinalitySketch}
import repro.data.{EdgeStream, GraphStream, Profile}

/** Shared drivers for the paper's evaluation artifacts (DESIGN.md §6).
  * Both the `jobs/` spark-submit entrypoints and the `bench/` suites call
  * these, so the tables in `bench_output.txt` and the jobs print the same
  * rows.
  *
  * Scaling (DESIGN.md §4): datasets and the shared memory M are both scaled
  * by `sigma` = 1/100 from the paper's setup (M = 5·10⁸ bits → 5·10⁶ bits),
  * which keeps the per-user memory of LPC/HLL++ identical to the paper; the
  * virtual-sketch size is rescaled from m = 1024 to m = 24 so the range
  * condition `Δ·n > m·ln m` singles out exactly Twitter and Orkut (CSE's
  * "N/A" rows), as in the paper's Table II.
  */
object Experiments {

  /** 1/100 of the paper's setup. */
  val DefaultSigma = 0.01
  /** Shared memory budget in bits (paper: 5e8, scaled by sigma). */
  val DefaultMBits = 5_000_000L
  /** Virtual sketch size for CSE/vHLL (paper: 1024; see scaling note). */
  val DefaultVirtualM = 24
  /** Super-spreader relative threshold, as in the paper. */
  val Delta = 5e-5
  /** Register width for FreeRS/vHLL, as in the paper (w = 5). */
  val RegisterWidth = 5
  /** Register width for HLL++, as in the paper (6-bit registers). */
  val HllppWidth = 6
  /** Duplicate-edge factor of the synthetic streams. */
  val DefaultDup = 1.3

  // ------------------------------------------------------------------ data

  final case class Dataset(paper: Profile, target: Profile, stream: EdgeStream)

  /** Generate the sigma-scaled replica of a paper dataset. */
  def dataset(p: Profile, sigma: Double = DefaultSigma, dup: Double = DefaultDup,
              seed: Long = 7L): Dataset = {
    val target = p.scaled(sigma)
    Dataset(p, target, GraphStream.generate(target, dup, seed))
  }

  // --------------------------------------------------------------- Table I

  final case class TableIRow(name: String, users: Int, maxCard: Int, totalCard: Long,
                             targetUsers: Int, targetMax: Int, targetTotal: Long)

  /** Measured stats of every generated replica next to its scaled targets. */
  def tableI(sigma: Double = DefaultSigma, dup: Double = DefaultDup,
             seed: Long = 7L): Seq[TableIRow] =
    Profile.all.map { p =>
      val ds = dataset(p, sigma, dup, seed)
      TableIRow(p.name, ds.stream.userCount, ds.stream.maxCardinality,
        ds.stream.totalCardinality, ds.target.users, ds.target.maxCard,
        ds.target.totalCard)
    }

  def renderTableI(rows: Seq[TableIRow]): String = {
    val sb = new StringBuilder
    sb.append(f"${"dataset"}%-12s ${"#users"}%12s ${"target"}%12s ${"max-card"}%10s ${"target"}%10s ${"total-card"}%14s ${"target"}%14s\n")
    rows.foreach { r =>
      sb.append(f"${r.name}%-12s ${r.users}%12d ${r.targetUsers}%12d ${r.maxCard}%10d ${r.targetMax}%10d ${r.totalCard}%14d ${r.targetTotal}%14d\n")
    }
    sb.toString
  }

  // ------------------------------------------------------------- sketches

  /** The five methods of Table II under a common memory budget of
    * `mBits` bits, for a dataset with `users` users: FreeBS gets mBits
    * bits; FreeRS and vHLL get mBits/5 5-bit registers; CSE shares mBits
    * bits with m virtual bits per user; HLL++ gets mBits/(6·users) 6-bit
    * registers per user.
    */
  def tableIISketches(mBits: Long, m: Int, users: Int, seed: Long): Seq[UserCardinalitySketch] = {
    val regs = (mBits / RegisterWidth).toInt
    val hllppM = math.max(2, (mBits / (HllppWidth.toLong * users)).toInt)
    Seq(
      new FreeBS(mBits, seed),
      new FreeRS(regs, RegisterWidth, seed + 1),
      new Cse(mBits, m, seed + 2),
      new Vhll(regs, m, RegisterWidth, seed + 3),
      new HllPlusPlus(hllppM, seed + 4),
    )
  }

  /** LPC sized like the paper's accuracy figure: mBits/users bits per user. */
  def lpcSketch(mBits: Long, users: Int, seed: Long): Lpc =
    new Lpc(math.max(1, (mBits / users).toInt), seed + 5)

  // -------------------------------------------------------------- Table II

  final case class TableIIRow(dataset: String, method: String, fnr: Double, fpr: Double,
                              trueSpreaders: Long, reportedNone: Boolean) {
    /** The paper reports "N/A" when a method reports an empty spreader set
      * while true spreaders exist (CSE's limited range on Twitter/Orkut).
      */
    def na: Boolean = reportedNone && trueSpreaders > 0
  }

  /** Super-spreader detection FNR/FPR for the five methods on one replica. */
  def tableIIFor(ds: Dataset, mBits: Long = DefaultMBits, m: Int = DefaultVirtualM,
                 delta: Double = Delta, seed: Long = 101L): Seq[TableIIRow] = {
    val st = ds.stream
    val threshold = delta * st.totalCardinality
    tableIISketches(mBits, m, st.userCount, seed).map { sk =>
      var i = 0
      while (i < st.length) { sk.update(st.users(i), st.items(i)); i += 1 }
      val (fnr, fpr, trueSp) = Metrics.superSpreader(st.truth, sk.estimate, threshold)
      var reported = 0L
      var u = 0
      while (u < st.userCount) { if (sk.estimate(u.toLong) >= threshold) reported += 1; u += 1 }
      TableIIRow(ds.paper.name, sk.name, fnr, fpr, trueSp, reported == 0)
    }
  }

  def tableII(profiles: Seq[Profile] = Profile.all, sigma: Double = DefaultSigma,
              mBits: Long = DefaultMBits, m: Int = DefaultVirtualM,
              delta: Double = Delta, dup: Double = DefaultDup,
              seed: Long = 7L): Seq[TableIIRow] =
    profiles.flatMap(p => tableIIFor(dataset(p, sigma, dup, seed), mBits, m, delta, seed + 94))

  def renderTableII(rows: Seq[TableIIRow]): String = {
    val methods = rows.map(_.method).distinct
    val sb = new StringBuilder
    def cell(r: TableIIRow, v: Double): String = if (r.na) "N/A" else f"$v%.2e"
    sb.append(f"${"dataset"}%-12s | FNR: ${methods.map(m => f"$m%9s").mkString(" ")} | FPR: ${methods.map(m => f"$m%9s").mkString(" ")}\n")
    rows.groupBy(_.dataset).toSeq
      .sortBy(g => rows.indexWhere(_.dataset == g._1))
      .foreach { case (dsName, dsRows) =>
        val byM = dsRows.map(r => r.method -> r).toMap
        val fnrs = methods.map(m => f"${cell(byM(m), byM(m).fnr)}%9s").mkString(" ")
        val fprs = methods.map(m => f"${cell(byM(m), byM(m).fpr)}%9s").mkString(" ")
        sb.append(f"$dsName%-12s |      $fnrs |      $fprs\n")
      }
    sb.toString
  }

  // ------------------------------------------- Figure 3 (runtime, as table)

  final case class RuntimeRow(method: String, m: Int, nsPerUpdate: Double)

  /** Mean ns/update of all six methods as the (virtual) per-user sketch
    * size m varies — the paper's Figure 3. Free* do not depend on m but are
    * re-measured per m to show the flat line.
    */
  def runtimeTable(ms: Seq[Int] = Seq(16, 64, 256, 1024),
                   profile: Profile = Profile.flickr,
                   sigma: Double = DefaultSigma,
                   mBits: Long = DefaultMBits,
                   seed: Long = 7L): Seq[RuntimeRow] = {
    val ds = dataset(profile, sigma, DefaultDup, seed)
    val st = ds.stream
    val warm = math.min(st.length / 4, 50_000)
    val measured = math.min(st.length - warm, 200_000)
    val regs = (mBits / RegisterWidth).toInt
    ms.flatMap { m =>
      val sketches: Seq[UserCardinalitySketch] = Seq(
        new FreeBS(mBits, seed),
        new FreeRS(regs, RegisterWidth, seed + 1),
        new Cse(mBits, m, seed + 2),
        new Vhll(regs, m, RegisterWidth, seed + 3),
        new Lpc(m, seed + 4),
        new HllPlusPlus(m, seed + 5),
      )
      sketches.map { sk =>
        RuntimeRow(sk.name, m, Harness.timed(sk, st.users, st.items, warm, measured))
      }
    }
  }

  def renderRuntime(rows: Seq[RuntimeRow]): String = {
    val ms = rows.map(_.m).distinct.sorted
    val methods = rows.map(_.method).distinct
    val sb = new StringBuilder
    sb.append(f"${"ns/update"}%-10s ${ms.map(m => f"m=$m%-6d").mkString(" ")}\n")
    methods.foreach { meth =>
      val vals = ms.map { m =>
        f"${rows.find(r => r.method == meth && r.m == m).get.nsPerUpdate}%-8.1f"
      }
      sb.append(f"$meth%-10s ${vals.mkString(" ")}\n")
    }
    sb.toString
  }

  // ------------------------------------------ Figure 5 (accuracy, as table)

  final case class AccuracyRow(method: String, bucketLow: Int, meanCard: Double,
                               rse: Double, users: Long)

  /** RSE per power-of-two cardinality bucket for the five Table II methods
    * plus LPC on one replica — the paper's Figure 5, as a table.
    */
  def accuracyTable(profile: Profile = Profile.orkut, sigma: Double = DefaultSigma,
                    mBits: Long = DefaultMBits, m: Int = DefaultVirtualM,
                    seed: Long = 7L): Seq[AccuracyRow] = {
    val ds = dataset(profile, sigma, DefaultDup, seed)
    val st = ds.stream
    val sketches = tableIISketches(mBits, m, st.userCount, seed + 11) :+
      lpcSketch(mBits, st.userCount, seed + 11)
    sketches.flatMap { sk =>
      var i = 0
      while (i < st.length) { sk.update(st.users(i), st.items(i)); i += 1 }
      Metrics.rseByBucket(st.truth, sk.estimate, Metrics.log2Bucket).toSeq.map {
        case (b, (meanN, rse, cnt)) => AccuracyRow(sk.name, 1 << b, meanN, rse, cnt)
      }
    }
  }

  def renderAccuracy(rows: Seq[AccuracyRow]): String = {
    val buckets = rows.map(_.bucketLow).distinct.sorted
    val methods = rows.map(_.method).distinct
    val sb = new StringBuilder
    sb.append(f"${"RSE"}%-10s ${buckets.map(b => f"n~$b%-8d").mkString(" ")}\n")
    methods.foreach { meth =>
      val vals = buckets.map { b =>
        rows.find(r => r.method == meth && r.bucketLow == b)
          .map(r => f"${r.rse}%-10.3f").getOrElse(" " * 10)
      }
      sb.append(f"$meth%-10s ${vals.mkString(" ")}\n")
    }
    sb.toString
  }

  /** Challenge-1 check: CSE/vHLL RSE for *small* users (n ≤ 4) as the
    * virtual sketch size m grows — the paper's claim that errors increase
    * with m for small cardinalities.
    */
  final case class SweepRow(method: String, m: Int, smallUserRse: Double)

  def mSweep(ms: Seq[Int] = Seq(16, 64, 256), profile: Profile = Profile.orkut,
             sigma: Double = DefaultSigma, mBits: Long = DefaultMBits,
             seed: Long = 7L): Seq[SweepRow] = {
    val ds = dataset(profile, sigma, DefaultDup, seed)
    val st = ds.stream
    val regs = (mBits / RegisterWidth).toInt
    // "Small users": n ≤ 4 when such users exist; otherwise fall back to
    // the smallest cardinality present (tiny test replicas may have min > 4).
    val cut = math.max(4, st.truth.min)
    ms.flatMap { m =>
      Seq[UserCardinalitySketch](
        new Cse(mBits, m, seed + 21), new Vhll(regs, m, RegisterWidth, seed + 22)
      ).map { sk =>
        var i = 0
        while (i < st.length) { sk.update(st.users(i), st.items(i)); i += 1 }
        val small = Metrics.rseByBucket(
          st.truth, sk.estimate, n => if (n <= cut) 0 else 1)
        SweepRow(sk.name, m, small(0)._2)
      }
    }
  }

  def renderSweep(rows: Seq[SweepRow]): String = {
    val sb = new StringBuilder
    sb.append("RSE of small users (n <= 4), by virtual sketch size m:\n")
    rows.groupBy(_.method).toSeq.sortBy(_._1).foreach { case (meth, rs) =>
      val cells = rs.sortBy(_.m).map(r => f"m=${r.m}%-4d ${r.smallUserRse}%.3f").mkString("   ")
      sb.append(f"$meth%-6s $cells\n")
    }
    sb.toString
  }
}
