package repro.core.offline

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** WINDOW UNION (Table 1, §5.2): aggregate over a time window whose
  * contents come from the primary table *and* one or more secondary
  * tables, partitioned by a shared key — without the UNION ALL +
  * origin-label boilerplate standard SQL would need.
  *
  * Offline plan shape: project every table to the shared (key, ts,
  * value-columns) schema with an `__is_primary` tag, `unionByName`,
  * compute the window aggregates over the union, then keep only primary
  * rows (secondary rows feed frames but produce no output).
  */
object WindowUnion {

  /** One aggregate to compute over the unioned window.
    *
    * @param name output column
    * @param agg  aggregate over the shared columns, e.g. sum(col("price"))
    *             or expr("topn_frequency(cat, 3)")
    */
  final case class UnionAgg(name: String, agg: Column)

  /** @param primary     the driving table (its rows are the output rows)
    * @param secondaries tables whose rows join the window frames; each must
    *                    contain `keyCol`, `tsCol` and the columns used by
    *                    the aggregates (missing ones are filled with null)
    * @param keyCol      PARTITION BY column
    * @param tsCol       ORDER BY column (epoch millis)
    * @param rangeMs     frame: RANGE BETWEEN rangeMs PRECEDING AND CURRENT ROW
    * @param aggs        aggregates evaluated over the unioned frame
    */
  def apply(primary: DataFrame, secondaries: Seq[DataFrame], keyCol: String,
            tsCol: String, rangeMs: Long, aggs: Seq[UnionAgg]): DataFrame = {
    val shared = primary.columns.toSeq
    val tagged = primary.withColumn("__is_primary", lit(1)) +:
      secondaries.map { s =>
        val cols = shared.map { c =>
          if (s.columns.contains(c)) col(c) else lit(null).cast(primary.schema(c).dataType).as(c)
        }
        s.select(cols: _*).withColumn("__is_primary", lit(0))
      }
    val unioned = tagged.reduce(_.unionByName(_))
    val w = Window.partitionBy(keyCol).orderBy(col(tsCol).cast("long"))
      .rangeBetween(-rangeMs, 0)
    val withAggs = aggs.foldLeft(unioned) { case (df, a) => df.withColumn(a.name, a.agg.over(w)) }
    withAggs.filter(col("__is_primary") === 1).drop("__is_primary")
  }
}
