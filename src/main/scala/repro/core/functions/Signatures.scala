package repro.core.functions

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

/** Feature signatures + ML-format export (§4.1 (5)): label columns pass
  * through, continuous columns become dense `idx:value` terms, discrete
  * columns are feature-hashed into high-dimensional `idx:1` one-hot
  * terms — emitted directly as LibSVM lines so raw ultra-high-dimension
  * tables never leave the engine.
  */
object Signatures {

  /** @param label       label column (rendered first on each line)
    * @param continuous  dense columns, assigned indices 0..c-1
    * @param discrete    (column, hashDim) pairs; column j's hash bucket is
    *                    offset after all continuous slots and prior dims
    */
  final case class Layout(label: String, continuous: Seq[String], discrete: Seq[(String, Int)]) {
    val continuousBase: Map[String, Int] = continuous.zipWithIndex.toMap
    val discreteBase: Map[String, Int] = {
      var off = continuous.size
      discrete.map { case (c, dim) => val b = off; off += dim; c -> b }.toMap
    }
    /** Total signature dimensionality. */
    val dim: Int = continuous.size + discrete.map(_._2).sum
  }

  /** LibSVM lines "label i:v ... j:1 ..." — null columns are skipped, as
    * LibSVM is a sparse format.
    */
  def toLibsvm(spark: SparkSession, df: DataFrame, layout: Layout): Dataset[String] = {
    Expressions.register(spark)
    val terms =
      layout.continuous.map(c =>
        when(col(c).isNotNull,
          expr(s"sig_continuous(${layout.continuousBase(c)}, cast($c as double))"))) ++
      layout.discrete.map { case (c, dim) =>
        when(col(c).isNotNull,
          expr(s"sig_discrete(${layout.discreteBase(c)}, cast($c as string), $dim)"))
      }
    val line = concat_ws(" ",
      (expr(s"sig_label(${layout.label})") +: terms): _*)
    import spark.implicits._
    df.select(line.as("line")).as[String]
  }
}
