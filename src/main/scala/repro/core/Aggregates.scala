package repro.core

import org.apache.spark.sql.{Encoder, Encoders, SparkSession}
import org.apache.spark.sql.expressions.Aggregator
import org.apache.spark.sql.functions

/** Custom aggregation functions the paper's template set uses but Spark
  * lacks: ENTROPY and MAD (Table II). Both are typed [[Aggregator]]s
  * registered in the session's function registry — the "new aggregate"
  * extension point — and both match DuckDB's `entropy()` / `mad()`
  * semantics so the result oracle can check them:
  *
  *  - ENTROPY: Shannon entropy (log base 2) of the value-frequency
  *    distribution within the group.
  *  - MAD: median absolute deviation, `median(|x - median(x)|)`, with the
  *    even-count median interpolated as the mean of the two middle values.
  *
  * Buffers are case classes over `Map`/`Vector` so Spark's product
  * ExpressionEncoder serializes them (Kryo-encoded buffers break inside
  * ScalaAggregator on Spark 4.1). Inputs are assumed non-null (the
  * synthetic generators produce no nulls); empty groups cannot occur
  * under GROUP BY.
  */
object Aggregates {

  /** Value-frequency buffer for ENTROPY. */
  final case class CountsBuf(counts: Map[Double, Long])
  /** Raw-values buffer for MAD (group sizes are small at our scale). */
  final case class ValuesBuf(values: Vector[Double])

  /** Shannon entropy (bits) over the multiset of group values. */
  object EntropyAgg extends Aggregator[Double, CountsBuf, Double] {
    override def zero: CountsBuf = CountsBuf(Map.empty)
    override def reduce(b: CountsBuf, a: Double): CountsBuf =
      CountsBuf(b.counts.updated(a, b.counts.getOrElse(a, 0L) + 1L))
    override def merge(b1: CountsBuf, b2: CountsBuf): CountsBuf =
      CountsBuf(b2.counts.foldLeft(b1.counts) { case (m, (k, v)) => m.updated(k, m.getOrElse(k, 0L) + v) })
    override def finish(b: CountsBuf): Double = {
      val n = b.counts.valuesIterator.sum.toDouble
      if (n <= 0) 0.0
      else {
        val h = -b.counts.valuesIterator.map { c => val p = c / n; p * math.log(p) / math.log(2.0) }.sum
        if (h == 0.0) 0.0 else h // normalize IEEE -0.0 from single-value groups
      }
    }
    override def bufferEncoder: Encoder[CountsBuf] = Encoders.product[CountsBuf]
    override def outputEncoder: Encoder[Double] = Encoders.scalaDouble
  }

  /** Median absolute deviation around the median. */
  object MadAgg extends Aggregator[Double, ValuesBuf, Double] {
    override def zero: ValuesBuf = ValuesBuf(Vector.empty)
    override def reduce(b: ValuesBuf, a: Double): ValuesBuf = ValuesBuf(b.values :+ a)
    override def merge(b1: ValuesBuf, b2: ValuesBuf): ValuesBuf = ValuesBuf(b1.values ++ b2.values)
    override def finish(b: ValuesBuf): Double = {
      if (b.values.isEmpty) 0.0
      else {
        val med = median(b.values.toArray)
        median(b.values.iterator.map(v => math.abs(v - med)).toArray)
      }
    }
    override def bufferEncoder: Encoder[ValuesBuf] = Encoders.product[ValuesBuf]
    override def outputEncoder: Encoder[Double] = Encoders.scalaDouble
  }

  /** Interpolated median: mean of the two middle values for even counts. */
  def median(values: Array[Double]): Double = {
    require(values.nonEmpty, "median of empty array")
    val s = values.sorted
    val n = s.length
    if (n % 2 == 1) s(n / 2) else (s(n / 2 - 1) + s(n / 2)) / 2.0
  }

  @volatile private var registered = false

  /** Register `fa_entropy` / `fa_mad` in the session once per JVM. */
  def register(spark: SparkSession): Unit = synchronized {
    if (!registered) {
      spark.udf.register("fa_entropy", functions.udaf(EntropyAgg, Encoders.scalaDouble))
      spark.udf.register("fa_mad", functions.udaf(MadAgg, Encoders.scalaDouble))
      registered = true
    }
  }
}
