package repro.dist

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.functions._
import scala.collection.mutable

import repro.core.{BitArray, Hashing, RegisterArray}

/** Distributed batch FreeBS/FreeRS over a Spark dataflow (DESIGN.md §3).
  *
  * The shared array of M positions is partitioned into P disjoint slices of
  * size M/P; pair e goes to slice `h*(e) mod P` at local position
  * `h*(e) div P`. Each slice is an independent FreeBS/FreeRS instance over
  * the sub-stream of pairs hashed into it (the hash shards pairs uniformly),
  * so its Horvitz–Thompson estimate of "distinct pairs of user s landing in
  * this slice" is unbiased, and summing slice estimates over P recovers an
  * unbiased estimate of n_s. The final array state (OR of bits / max of
  * registers) is identical to the sequential run.
  */
object SlicedFree {

  /** One stream edge: arrival index t, user s, item d. */
  final case class Edge(t: Long, s: Long, d: Long)

  /** Per-user estimates (columns s, estimate) via slice-partitioned FreeBS.
    *
    * @param bigM shared bit-array size; must be divisible by slices
    */
  def freeBS(edges: Dataset[Edge], bigM: Long, slices: Int, seed: Long = 17L): DataFrame = {
    require(slices > 0 && bigM % slices == 0, s"bigM=$bigM must be divisible by slices=$slices")
    val spark = edges.sparkSession
    import spark.implicits._
    val sliceSize = bigM / slices

    edges
      .groupByKey(e => (Hashing.pairIndex(e.s, e.d, bigM, seed) % slices).toInt)
      .flatMapGroups { (_: Int, it: Iterator[Edge]) =>
        val buf = it.toArray.sortBy(_.t) // deterministic within-slice order
        val bits = new BitArray(sliceSize)
        val est = mutable.LongMap.empty[Double]
        buf.foreach { e =>
          val local = Hashing.pairIndex(e.s, e.d, bigM, seed) / slices
          val zeros = bits.zeros
          if (bits.set(local))
            est(e.s) = est.getOrElse(e.s, 0.0) + sliceSize.toDouble / zeros
        }
        est.iterator.map { case (s, v) => (s, v) }
      }
      .toDF("s", "delta")
      .groupBy("s")
      .agg(sum("delta") as "estimate")
  }

  /** Per-user estimates (columns s, estimate) via slice-partitioned FreeRS. */
  def freeRS(edges: Dataset[Edge], bigM: Int, slices: Int, width: Int = 5,
             seed: Long = 29L): DataFrame = {
    require(slices > 0 && bigM % slices == 0, s"bigM=$bigM must be divisible by slices=$slices")
    val spark = edges.sparkSession
    import spark.implicits._
    val sliceSize = bigM / slices

    edges
      .groupByKey(e => (Hashing.pairIndex(e.s, e.d, bigM.toLong, seed) % slices).toInt)
      .flatMapGroups { (_: Int, it: Iterator[Edge]) =>
        val buf = it.toArray.sortBy(_.t)
        val regs = new RegisterArray(sliceSize.toInt, width)
        val est = mutable.LongMap.empty[Double]
        buf.foreach { e =>
          val local = (Hashing.pairIndex(e.s, e.d, bigM.toLong, seed) / slices).toInt
          val r = Hashing.pairRank(e.s, e.d, regs.maxValue, seed)
          val qPre = regs.sumPow2Neg / sliceSize
          if (regs.update(local, r))
            est(e.s) = est.getOrElse(e.s, 0.0) + 1.0 / qPre
        }
        est.iterator.map { case (s, v) => (s, v) }
      }
      .toDF("s", "delta")
      .groupBy("s")
      .agg(sum("delta") as "estimate")
  }

  /** Final global bit positions that any FreeBS execution (sequential or
    * sliced) sets for this edge set — order-independent; used by tests to
    * prove state equivalence across execution strategies.
    */
  def globalBitPositions(edges: Dataset[Edge], bigM: Long, seed: Long = 17L): Array[Long] = {
    val spark = edges.sparkSession
    import spark.implicits._
    edges.map(e => Hashing.pairIndex(e.s, e.d, bigM, seed)).distinct().collect().sorted
  }
}
