package repro.core.functions

import org.apache.spark.sql.{Encoder, Encoders, SparkSession}
import org.apache.spark.sql.expressions.Aggregator
import org.apache.spark.sql.functions

/** Spark `Aggregator` wrappers around [[AggCore]] states.
  *
  * Registered through `spark.udf.register(functions.udaf(...))` so every
  * OpenMLDB-SQL function is callable from SQL text, including inside
  * `OVER (...)` window clauses. Because the wrapped states are the exact
  * objects the online request engine folds, offline and online feature
  * values agree bit-for-bit — the paper's unified-plan-generator claim.
  *
  * Order-sensitive functions (`drawdown`, `ew_avg`) rely on Spark's
  * window evaluation feeding frame rows in ORDER BY order; they are only
  * registered for window use (tests pin this behaviour).
  */
object Aggregators {
  import AggCore._

  private def kryo[T](implicit ct: scala.reflect.ClassTag[T]): Encoder[T] =
    Encoders.kryo(ct.runtimeClass.asInstanceOf[Class[T]])

  /** topn_frequency(col, n) — n is passed per-row and captured once. */
  final class TopNFreqAgg extends Aggregator[(String, Int), TopNFreqState, String] {
    def zero: TopNFreqState = new TopNFreqState(0)
    def reduce(b: TopNFreqState, a: (String, Int)): TopNFreqState = {
      if (a._2 > 0) b.n = a._2
      b.update(a._1); b
    }
    def merge(b1: TopNFreqState, b2: TopNFreqState): TopNFreqState = {
      if (b1.n == 0) b1.n = b2.n
      b1.merge(b2); b1
    }
    def finish(b: TopNFreqState): String = b.result
    def bufferEncoder: Encoder[TopNFreqState] = kryo
    def outputEncoder: Encoder[String] = Encoders.STRING
  }

  /** avg_cate_where(value, cond, category). */
  final class AvgCateWhereAgg
      extends Aggregator[(java.lang.Double, java.lang.Boolean, String), AvgCateWhereState, String] {
    def zero: AvgCateWhereState = new AvgCateWhereState
    def reduce(b: AvgCateWhereState, a: (java.lang.Double, java.lang.Boolean, String)): AvgCateWhereState = {
      b.update(a); b
    }
    def merge(b1: AvgCateWhereState, b2: AvgCateWhereState): AvgCateWhereState = { b1.merge(b2); b1 }
    def finish(b: AvgCateWhereState): String = b.result
    def bufferEncoder: Encoder[AvgCateWhereState] = kryo
    def outputEncoder: Encoder[String] = Encoders.STRING
  }

  /** drawdown(col) — order-sensitive (window use). */
  final class DrawdownAgg extends Aggregator[java.lang.Double, DrawdownState, java.lang.Double] {
    def zero: DrawdownState = new DrawdownState
    def reduce(b: DrawdownState, a: java.lang.Double): DrawdownState = { b.update(a); b }
    def merge(b1: DrawdownState, b2: DrawdownState): DrawdownState =
      throw new UnsupportedOperationException(
        "drawdown is order-sensitive; use it over a window, not in a grouped aggregate")
    def finish(b: DrawdownState): java.lang.Double = b.result
    def bufferEncoder: Encoder[DrawdownState] = kryo
    def outputEncoder: Encoder[java.lang.Double] = Encoders.DOUBLE
  }

  /** ew_avg(col, alpha) — order-sensitive (window use). */
  final class EwAvgAgg extends Aggregator[(java.lang.Double, java.lang.Double), EwAvgState, java.lang.Double] {
    def zero: EwAvgState = new EwAvgState(Double.NaN)
    def reduce(b: EwAvgState, a: (java.lang.Double, java.lang.Double)): EwAvgState = {
      if (a._2 != null && b.alpha.isNaN) b.alpha = a._2
      b.update(a._1); b
    }
    def merge(b1: EwAvgState, b2: EwAvgState): EwAvgState =
      throw new UnsupportedOperationException(
        "ew_avg is order-sensitive; use it over a window, not in a grouped aggregate")
    def finish(b: EwAvgState): java.lang.Double = b.result
    def bufferEncoder: Encoder[EwAvgState] = kryo
    def outputEncoder: Encoder[java.lang.Double] = Encoders.DOUBLE
  }

  /** distinct_count(col) — exact distinct over a window frame. */
  final class DistinctCountAgg extends Aggregator[String, DistinctCountState, java.lang.Long] {
    def zero: DistinctCountState = new DistinctCountState
    def reduce(b: DistinctCountState, a: String): DistinctCountState = { b.update(a); b }
    def merge(b1: DistinctCountState, b2: DistinctCountState): DistinctCountState = { b1.merge(b2); b1 }
    def finish(b: DistinctCountState): java.lang.Long = b.result
    def bufferEncoder: Encoder[DistinctCountState] = kryo
    def outputEncoder: Encoder[java.lang.Long] = Encoders.LONG
  }

  /** Register every OpenMLDB aggregate in the session (idempotent). */
  def register(spark: SparkSession): Unit = {
    spark.udf.register("topn_frequency", functions.udaf(new TopNFreqAgg))
    spark.udf.register("avg_cate_where", functions.udaf(new AvgCateWhereAgg))
    spark.udf.register("drawdown", functions.udaf(new DrawdownAgg))
    spark.udf.register("ew_avg", functions.udaf(new EwAvgAgg))
    spark.udf.register("distinct_count", functions.udaf(new DistinctCountAgg))
  }
}
