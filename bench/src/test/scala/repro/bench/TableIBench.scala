package repro.bench

import repro.SparkSpec
import repro.data.Profile
import repro.eval.Experiments

/** Table I of the paper — dataset summary statistics.
  *
  * Generates the 1/100-scale replicas of all six datasets and prints the
  * measured (#users, max cardinality, total cardinality) next to the scaled
  * targets. The paper's full-scale numbers are recorded in EXPERIMENTS.md.
  */
class TableIBench extends SparkSpec {

  test("Table I: replica statistics match the scaled paper targets") {
    val rows = Experiments.tableI(sigma = Experiments.DefaultSigma)
    println()
    println("===== Table I (replicas at sigma = 1/100; targets = paper x sigma) =====")
    println(Experiments.renderTableI(rows))

    assert(rows.map(_.name) == Profile.all.map(_.name))
    rows.foreach { r =>
      assert(r.users == r.targetUsers, s"${r.name}: user count off")
      assert(r.maxCard == r.targetMax, s"${r.name}: max cardinality off")
      assert(math.abs(r.totalCard - r.targetTotal).toDouble / r.targetTotal < 0.02,
        s"${r.name}: total ${r.totalCard} deviates >2% from ${r.targetTotal}")
    }
  }

  test("Table I: replicas preserve the heavy-tailed cardinality shape") {
    Profile.all.foreach { p =>
      val ds = Experiments.dataset(p)
      val truth = ds.stream.truth
      val mean = truth.map(_.toLong).sum.toDouble / truth.length
      // Heavy tail: the maximum dwarfs the mean, and most users sit below
      // it. (Orkut's scaled max/mean ratio is the smallest at ~4.3.)
      assert(truth.max > 3 * mean, s"${p.name}: max ${truth.max} vs mean $mean")
      val below = truth.count(_ <= mean)
      assert(below > truth.length / 2, s"${p.name}: only $below/${truth.length} below mean")
    }
  }
}
