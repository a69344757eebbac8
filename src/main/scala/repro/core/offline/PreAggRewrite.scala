package repro.core.offline

import java.util.concurrent.atomic.AtomicLong
import scala.collection.concurrent.TrieMap

import org.apache.spark.sql.{DataFrame, ReproShim, SparkSession}
import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.expressions.aggregate._
import org.apache.spark.sql.catalyst.plans.logical._
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.functions.{col, sum => ssum, min => smin, max => smax}

/** Offline flavour of long-window pre-aggregation (§5.1) expressed at the
  * Catalyst layer: a genuine `Rule[LogicalPlan]` injected through
  * `spark.experimental.extraOptimizations`.
  *
  * A base table is registered together with its pre-aggregated companion
  * (per key, per time bucket: count / sum / min / max partials). Queries of
  * the shape
  *
  *   SELECT key, agg(value) FROM base WHERE ts BETWEEN lo AND hi GROUP BY key
  *
  * whose `[lo, hi]` is bucket-aligned are rewritten to merge the partials
  * instead of scanning raw rows — the paper's "replace expensive raw data
  * scans with efficient lookups in the aggregator hierarchy". Non-aligned
  * ranges and unsupported aggregates are left untouched (the online
  * engine's finer levels handle ragged edges; offline we only rewrite
  * exact covers).
  *
  * The base table is tagged with a [[PreAggMarker]] logical node (attached
  * through the `Dataset.ofRows` shim); unconsumed markers are stripped by
  * the same rule so unmatched queries execute unchanged.
  */
object PreAggRewrite {

  /** Marker wrapping a registered base table's plan. No-op semantics. */
  case class PreAggMarker(child: LogicalPlan, tag: String) extends UnaryNode {
    override def output: Seq[Attribute] = child.output
    override protected def withNewChildInternal(c: LogicalPlan): LogicalPlan = copy(child = c)
  }

  /** Registered pre-agg companion: `preAgg` has columns
    * (key, bucket_start, cnt, sum, min, max) for `bucketMs` buckets.
    */
  final case class Registration(preAgg: DataFrame, keyCol: String, tsCol: String,
                                valCol: String, bucketMs: Long)

  private val registry = TrieMap.empty[String, Registration]
  val rewriteHits = new AtomicLong(0)

  def register(tag: String, r: Registration): Unit = registry(tag) = r
  def clear(): Unit = { registry.clear(); rewriteHits.set(0) }

  /** Tag a base-table DataFrame so the rule can recognise it. */
  def tagged(spark: SparkSession, base: DataFrame, tag: String): DataFrame =
    ReproShim.ofRows(spark, PreAggMarker(base.queryExecution.analyzed, tag))

  /** Build the pre-agg companion table for a base table. */
  def buildPreAgg(base: DataFrame, keyCol: String, tsCol: String, valCol: String,
                  bucketMs: Long): DataFrame = {
    val bucket = (col(tsCol).cast("long") / bucketMs).cast("long") * bucketMs
    base.groupBy(col(keyCol).as("key"), bucket.as("bucket_start"))
      .agg(org.apache.spark.sql.functions.count(col(valCol)).as("cnt"),
           ssum(col(valCol)).as("sum"),
           smin(col(valCol)).as("min"),
           smax(col(valCol)).as("max"))
  }

  /** Install the rule once per session (idempotent). */
  def install(spark: SparkSession): Unit = {
    val existing = spark.experimental.extraOptimizations
    if (!existing.exists(_.isInstanceOf[RewriteRule])) {
      spark.experimental.extraOptimizations = existing :+ new RewriteRule(spark)
    }
  }

  final class RewriteRule(spark: SparkSession) extends Rule[LogicalPlan] {

    override def apply(plan: LogicalPlan): LogicalPlan = {
      val rewritten = plan.transformDown {
        case agg @ Aggregate(_, _, _, _) =>
          tryRewrite(agg).getOrElse(agg)
      }
      // Strip any marker the rewrite did not consume.
      rewritten.transformDown { case PreAggMarker(child, _) => child }
    }

    /** Strips attribute-only pruning Projects (ColumnPruning inserts them
      * above and below the Filter; the rewrite rebuilds the plan anyway).
      */
    private def stripProj(plan: LogicalPlan): LogicalPlan = plan match {
      case Project(pl, c) if pl.forall(_.isInstanceOf[Attribute]) => stripProj(c)
      case other => other
    }

    private def unwrap(plan: LogicalPlan): Option[(LogicalPlan, String)] = stripProj(plan) match {
      case PreAggMarker(c, tag) => Some((c, tag))
      case _                    => None
    }

    private def longLit(e: Expression): Option[Long] = e match {
      case Literal(v: Long, _)    => Some(v)
      case Literal(v: Int, _)     => Some(v.toLong)
      case Cast(ch, _, _, _)      => longLit(ch)
      case _                      => None
    }

    private def conjuncts(e: Expression): Seq[Expression] = e match {
      case org.apache.spark.sql.catalyst.expressions.And(l, r) => conjuncts(l) ++ conjuncts(r)
      case other => Seq(other)
    }

    /** Extract `lo <= ts <= hi` from the filter condition, tolerating the
      * IsNotNull conjuncts the optimizer infers; any other predicate
      * disqualifies the rewrite.
      */
    private def tsBounds(cond: Expression, tsName: String): Option[(Long, Long)] = {
      var lo: Option[Long] = None
      var hi: Option[Long] = None
      val ok = conjuncts(cond).forall {
        case IsNotNull(_) => true
        case GreaterThanOrEqual(a: AttributeReference, l) if a.name == tsName =>
          lo = longLit(l); lo.isDefined
        case LessThanOrEqual(a: AttributeReference, h) if a.name == tsName =>
          hi = longLit(h); hi.isDefined
        case LessThanOrEqual(l, a: AttributeReference) if a.name == tsName =>
          lo = longLit(l); lo.isDefined
        case GreaterThanOrEqual(h, a: AttributeReference) if a.name == tsName =>
          hi = longLit(h); hi.isDefined
        case _ => false
      }
      if (ok) for (l <- lo; h <- hi) yield (l, h) else None
    }

    private def tryRewrite(agg: Aggregate): Option[LogicalPlan] = {
      val Aggregate(grouping, aggExprs, child, _) = agg
      val (cond, inner) = stripProj(child) match {
        case Filter(c, in) => (c, in)
        case _             => return None
      }
      val (_, tag) = unwrap(inner).getOrElse(return None)
      val reg = registry.get(tag).getOrElse(return None)

      // Grouping must be exactly the registered key column.
      val keyAttr = grouping match {
        case Seq(a: AttributeReference) if a.name == reg.keyCol => a
        case _ => return None
      }
      val (lo, hi) = tsBounds(cond, reg.tsCol).getOrElse(return None)
      // Only exact bucket covers are rewritten offline.
      if (lo % reg.bucketMs != 0 || (hi + 1) % reg.bucketMs != 0 || hi < lo) return None

      // Merge plan over the pre-agg companion.
      val merged = reg.preAgg
        .filter(col("bucket_start") >= lo && col("bucket_start") <= hi)
        .groupBy(col("key"))
        .agg(ssum(col("cnt")).as("m_cnt"), ssum(col("sum")).as("m_sum"),
             smin(col("min")).as("m_min"), smax(col("max")).as("m_max"))
      val mergedPlan = merged.queryExecution.analyzed
      val out = mergedPlan.output
      def o(name: String) = out.find(_.name == name).get

      // Rebind every original output column onto the merged columns,
      // keeping the original exprIds so parents stay resolved.
      val projections: Seq[NamedExpression] = aggExprs.map { ne =>
        val replacement: Option[Expression] = ne match {
          case a: AttributeReference if a.semanticEquals(keyAttr) => Some(o("key"))
          case Alias(ae: AggregateExpression, _) => rewriteAgg(ae, o, reg)
          case _ => None
        }
        replacement match {
          case Some(r) => Alias(Cast(r, ne.dataType, None), ne.name)(exprId = ne.exprId)
          case None    => return None // unsupported output shape: keep original plan
        }
      }
      rewriteHits.incrementAndGet()
      Some(Project(projections, mergedPlan))
    }

    private def rewriteAgg(ae: AggregateExpression, o: String => Attribute,
                           reg: Registration): Option[Expression] = {
      if (ae.isDistinct || ae.filter.isDefined) return None
      def isVal(e: Expression) = e match {
        case a: AttributeReference => a.name == reg.valCol
        case Cast(a: AttributeReference, _, _, _) => a.name == reg.valCol
        case _ => false
      }
      ae.aggregateFunction match {
        case Sum(e, _) if isVal(e)      => Some(o("m_sum"))
        case Min(e) if isVal(e)         => Some(o("m_min"))
        case Max(e) if isVal(e)         => Some(o("m_max"))
        case Count(Seq(e)) if isVal(e) || e == Literal(1) => Some(o("m_cnt"))
        case Count(Seq())               => Some(o("m_cnt"))
        case Average(e, _) if isVal(e)  =>
          Some(Divide(Cast(o("m_sum"), org.apache.spark.sql.types.DoubleType, None),
                      Cast(o("m_cnt"), org.apache.spark.sql.types.DoubleType, None)))
        case _ => None
      }
    }
  }
}
