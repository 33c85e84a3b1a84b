package repro.dist

import org.apache.spark.sql.{Encoder, Encoders, SparkSession}
import org.apache.spark.sql.expressions.Aggregator
import org.apache.spark.sql.functions

import repro.baselines.Hll
import repro.core.Hashing

/** Register-sharing sketch as a first-class Spark SQL aggregate
  * (DESIGN.md §3: the Catalyst extension point used here is
  * `org.apache.spark.sql.expressions.Aggregator` registered through
  * `functions.udaf`, making the sketch usable from SQL / `agg`).
  *
  * The buffer is a raw register byte array merged by element-wise max —
  * the same mergeable-state property the slice-partitioned dataflow relies
  * on — and `finish` applies the HLL estimator with the linear-counting
  * small-range switch.
  */
final class DistinctCountSketch(m: Int, seed: Long) extends Aggregator[Long, Array[Byte], Long] {
  require(m >= 16, s"sketch needs at least 16 registers, got $m")

  override def zero: Array[Byte] = new Array[Byte](m)

  override def reduce(b: Array[Byte], d: Long): Array[Byte] = {
    val pos = Hashing.itemIndex(d, m.toLong, seed).toInt
    val r = Hashing.rank(d, 63, seed)
    if (r > b(pos)) b(pos) = r.toByte
    b
  }

  override def merge(a: Array[Byte], b: Array[Byte]): Array[Byte] = {
    var i = 0
    while (i < m) { if (b(i) > a(i)) a(i) = b(i); i += 1 }
    a
  }

  override def finish(b: Array[Byte]): Long = math.round(Hll.estimateFromRegisters(b))

  override def bufferEncoder: Encoder[Array[Byte]] = Encoders.BINARY
  override def outputEncoder: Encoder[Long] = Encoders.scalaLong
}

object SketchAggregates {

  /** Register `name(col)` as a SQL aggregate estimating COUNT(DISTINCT col)
    * for a LongType column with a `m`-register sketch.
    */
  def register(spark: SparkSession, name: String = "sketch_distinct",
               m: Int = 4096, seed: Long = 97L): Unit =
    spark.udf.register(name, functions.udaf(new DistinctCountSketch(m, seed)))
}
