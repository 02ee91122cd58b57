package repro.catalyst

import org.apache.spark.sql.SparkSessionExtensions
import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.expressions.aggregate._
import org.apache.spark.sql.catalyst.plans.logical._
import org.apache.spark.sql.catalyst.rules.Rule

/** The intra-TVR `+γ` merge expressed at the Catalyst extension point:
  *
  * {{{ γ(A ∪ B)  →  γ_merge( γ_partial(A) ∪ γ_partial(B) ) }}}
  *
  * When an aggregate consumes a union of a snapshot and a delta (the merged
  * TVR of §3.2), pushing partial aggregation below the union computes each
  * side's aggregate state independently and merges states — the snapshot
  * side's state can then be cached/materialized by Spark across runs.
  *
  * Supports decomposable aggregates (SUM/COUNT/MIN/MAX, complete mode, no
  * DISTINCT/FILTER) over plain attribute group keys. Inject with
  * `spark.experimental.extraOptimizations` or via [[TempuraExtensions]].
  */
object PartialAggPushdown extends Rule[LogicalPlan] {

  private def decomposable(e: AggregateExpression): Boolean =
    e.mode == Complete && !e.isDistinct && e.filter.isEmpty && (e.aggregateFunction match {
      case _: Sum | _: Count | _: Min | _: Max => true
      case _ => false
    })

  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformUp {
    case agg @ Aggregate(groupExprs, aggExprs, u: Union, _)
        if u.children.size >= 2 &&
          // don't re-fire on our own partial-aggregate output
          !u.children.forall(_.isInstanceOf[Aggregate]) &&
          groupExprs.forall(_.isInstanceOf[Attribute]) &&
          aggExprs.forall {
            case _: Attribute => true
            case Alias(ae: AggregateExpression, _) => decomposable(ae)
            case _ => false
          } &&
          aggExprs.exists {
            case Alias(_: AggregateExpression, _) => true; case _ => false
          } =>
      rewrite(agg, groupExprs.map(_.asInstanceOf[Attribute]), aggExprs, u)
  }

  private def rewrite(agg: Aggregate, keys: Seq[Attribute],
                      aggExprs: Seq[NamedExpression], u: Union): LogicalPlan = {
    val unionOut = u.output
    val aggCalls = aggExprs.collect { case a @ Alias(ae: AggregateExpression, _) => (a, ae) }

    // per-branch partial aggregates
    val branchAggs = u.children.map { branch =>
      val attrMap: Map[ExprId, Attribute] =
        unionOut.map(_.exprId).zip(branch.output).toMap
      def remap(e: Expression): Expression = e.transform {
        case a: Attribute => attrMap.getOrElse(a.exprId, a)
      }
      val remappedKeys = keys.map(remap)
      val keyAliases = keys.zip(remappedKeys).map { case (k, rk) => Alias(rk, k.name)() }
      val partials = aggCalls.zipWithIndex.map { case ((_, ae), i) =>
        Alias(ae.copy(aggregateFunction =
          ae.aggregateFunction.mapChildren(remap).asInstanceOf[AggregateFunction]), s"__p$i")()
      }
      Aggregate(remappedKeys, keyAliases ++ partials, branch)
    }

    val merged = Union(branchAggs)
    val mOut = merged.output
    val mKeys = mOut.take(keys.size)
    val mPartials = mOut.drop(keys.size)

    // merge layer: re-aggregate the partial states
    val outExprs: Seq[NamedExpression] = aggExprs.map {
      case a: Attribute =>
        val idx = keys.indexWhere(_.exprId == a.exprId)
        Alias(mKeys(idx), a.name)(exprId = a.exprId)
      case al @ Alias(ae: AggregateExpression, name) =>
        val idx = aggCalls.indexWhere(_._1.exprId == al.exprId)
        val p = mPartials(idx)
        val mergeFn: AggregateFunction = ae.aggregateFunction match {
          case _: Sum   => Sum(p)
          case _: Count => Sum(p) // counts merge by summation
          case _: Min   => Min(p)
          case _: Max   => Max(p)
          case other    => throw new IllegalStateException(s"unexpected $other")
        }
        val mergedExpr: Expression = ae.aggregateFunction match {
          // SUM of partial COUNTs is LongType already, but SUM widens to
          // long -> long here; keep the original data type via cast if needed
          case _: Count =>
            val s = AggregateExpression(mergeFn, Complete, isDistinct = false)
            if (s.dataType == ae.dataType) s else Cast(s, ae.dataType)
          case _ => AggregateExpression(mergeFn, Complete, isDistinct = false)
        }
        Alias(mergedExpr, name)(exprId = al.exprId)
      case other => other
    }
    Aggregate(mKeys, outExprs, merged)
  }
}

/** SparkSessionExtensions builder injecting the TVR merge rewrite, for
  * `spark.sql.extensions=repro.catalyst.TempuraExtensions`.
  */
class TempuraExtensions extends (SparkSessionExtensions => Unit) {
  override def apply(ext: SparkSessionExtensions): Unit =
    ext.injectOptimizerRule(_ => PartialAggPushdown)
}
