package repro.core.offline

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Time-aware data-skew resolving (§6.2).
  *
  * Plain "salting" breaks window semantics (rows of one key scatter into
  * partitions that can no longer see each other's frames), so OpenMLDB
  * repartitions *along time*:
  *
  *  1. Determine partition boundaries: timestamp percentiles
  *     PERCENTILE_1..PERCENTILE_{n-1} split the data into n quantile
  *     ranges (approximate sketch — the paper's no-full-scan point).
  *  2. Assign repartition identifiers: every row gets PART_ID = its time
  *     range, and EXPANDED_ROW = false.
  *  3. Augment window data: each partition also receives copies of the
  *     preceding rows that its window frames reach back into
  *     (ts ∈ (boundary - windowMs, boundary]), flagged EXPANDED_ROW=true.
  *  4. Redistribute by (key, PART_ID) — parallelism rises from |keys| to
  *     |keys| × n.
  *  5. Compute windows per (key, PART_ID); EXPANDED_ROW rows provide
  *     frame context but are dropped from the output.
  *
  * Supported computation shape: time-range frames
  * `RANGE BETWEEN windowMs PRECEDING AND CURRENT ROW` partitioned by
  * `keyCol` ordered by `tsCol` — exactly the feature-window pattern the
  * paper optimizes. Results are identical to the naive single-partition-
  * per-key plan (tested against it and against DuckDB).
  */
object SkewResolver {

  final case class SkewAgg(name: String, agg: Column)

  /** The naive baseline: one Spark partition per key. */
  def naive(df: DataFrame, keyCol: String, tsCol: String, windowMs: Long,
            aggs: Seq[SkewAgg]): DataFrame = {
    val w = Window.partitionBy(keyCol).orderBy(col(tsCol).cast("long")).rangeBetween(-windowMs, 0)
    aggs.foldLeft(df) { case (d, a) => d.withColumn(a.name, a.agg.over(w)) }
  }

  /** The time-aware repartitioned plan.
    *
    * @param nParts   the skew factor (paper's "skew 2" / "skew 4"): number
    *                 of time ranges each key is split into
    */
  def optimized(df: DataFrame, keyCol: String, tsCol: String, windowMs: Long,
                aggs: Seq[SkewAgg], nParts: Int): DataFrame = {
    require(nParts >= 1)
    if (nParts == 1) return naive(df, keyCol, tsCol, windowMs, aggs)

    // (1) Percentile boundaries over the timestamp column (approximate).
    val probs = (1 until nParts).map(_.toDouble / nParts).toArray
    val bounds = df.stat.approxQuantile(tsCol, probs, 0.001).map(_.toLong).distinct.sorted
    if (bounds.isEmpty) return naive(df, keyCol, tsCol, windowMs, aggs)

    // (2) PART_ID: index of the time range (ts <= bounds(i) -> i).
    val ts = col(tsCol).cast("long")
    val partId: Column = bounds.zipWithIndex.foldRight(lit(bounds.length): Column) {
      case ((b, i), rest) => when(ts <= b, lit(i)).otherwise(rest)
    }
    val tagged = df.withColumn("__part_id", partId).withColumn("__expanded", lit(false))

    // (3) EXPANDED_ROW copies: a row at time t is context for partition i
    //     (> its own) when t ∈ (bounds(i-1) - windowMs, bounds(i-1)].
    val expanded = bounds.zipWithIndex.map { case (b, i) =>
      df.filter(ts > b - windowMs && ts <= b)
        .withColumn("__part_id", lit(i + 1))
        .withColumn("__expanded", lit(true))
    }
    // A row can be context for several later partitions when ranges are
    // narrower than the window; each copy targets one partition.
    val augmented = (tagged +: expanded).reduce(_.unionByName(_))

    // (4)+(5) Redistribute by (key, PART_ID) and compute; drop context rows.
    val w = Window.partitionBy(col(keyCol), col("__part_id"))
      .orderBy(ts).rangeBetween(-windowMs, 0)
    val computed = aggs.foldLeft(
      augmented.repartition(col(keyCol), col("__part_id"))
    ) { case (d, a) => d.withColumn(a.name, a.agg.over(w)) }
    computed.filter(!col("__expanded")).drop("__part_id", "__expanded")
  }
}
