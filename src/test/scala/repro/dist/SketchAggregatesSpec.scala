package repro.dist

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}

class SketchAggregatesSpec extends SparkSpec {

  private lazy val registered: Unit = SketchAggregates.register(spark, "sketch_distinct", 4096, 97L)

  test("global distinct count within 10% of exact (m = 4096 → σ ≈ 1.6%)") {
    registered
    val df = SynthData.uniformKeys(spark, rows = 50000, nKeys = 20000, seed = 3).cache()
    df.createOrReplaceTempView("keys_glob")
    val est = spark.sql("SELECT sketch_distinct(k) AS n FROM keys_glob").collect()(0).getLong(0)
    val exact = df.select("k").distinct().count()
    assert(math.abs(est - exact) < 0.1 * exact, s"estimate $est vs exact $exact")
  }

  test("per-group estimates track per-group exact counts") {
    registered
    val df = SynthData.bipartiteEdges(spark, rows = 30000, nUsers = 20, nItems = 5000, seed = 5)
      .cache()
    df.createOrReplaceTempView("edges_agg")
    val est = spark.sql("SELECT s, sketch_distinct(d) AS n FROM edges_agg GROUP BY s")
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    val exact = df.groupBy("s").agg(countDistinct("d") as "n")
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    exact.foreach { case (s, n) =>
      val tol = math.max(3.0, 0.15 * n)
      assert(math.abs(est(s) - n) <= tol, s"user $s: est ${est(s)} vs exact $n")
    }
  }

  test("small groups are near-exact via linear counting") {
    registered
    import spark.implicits._
    val df = Seq((1L, 10L), (1L, 11L), (1L, 10L), (2L, 20L)).toDF("s", "d")
    df.createOrReplaceTempView("edges_small")
    val est = spark.sql("SELECT s, sketch_distinct(d) AS n FROM edges_small GROUP BY s")
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    assert(est(1L) == 2L && est(2L) == 1L)
  }

  test("exact side of the comparison is itself oracle-verified") {
    val df = SynthData.bipartiteEdges(spark, rows = 4000, nUsers = 15, nItems = 300, seed = 7)
      .select("s", "d").cache()
    Oracle.assertEquivalent(
      df.groupBy("s").agg(countDistinct("d") as "n"),
      "SELECT s, count(DISTINCT d) AS n FROM edges GROUP BY s",
      "edges" -> df)
  }

  test("the aggregate merges across shuffle partitions consistently") {
    registered
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 5000, seed = 9)
    val a = df.repartition(1).agg(expr("sketch_distinct(k)") as "n").collect()(0).getLong(0)
    val b = df.repartition(16).agg(expr("sketch_distinct(k)") as "n").collect()(0).getLong(0)
    assert(a == b, s"partitioning changed the estimate: $a vs $b")
  }

  test("registration rejects undersized sketches") {
    intercept[IllegalArgumentException](new DistinctCountSketch(8, 1L))
  }
}
