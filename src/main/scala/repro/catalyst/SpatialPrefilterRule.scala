package repro.catalyst

import org.apache.spark.sql.catalyst.expressions.{And, ArrayMax, ArrayMin, Expression, GreaterThanOrEqual, LessThanOrEqual}
import org.apache.spark.sql.catalyst.plans.logical.LogicalPlan
import org.apache.spark.sql.catalyst.rules.Rule

/** Catalyst optimizer rule (injected via
  * `spark.experimental.extraOptimizations`): rewrite every
  * `st_contains(xs, ys, x, y)` into
  *
  * {{{ x >= min(xs) AND x <= max(xs) AND y >= min(ys) AND y <= max(ys)
  *     AND st_contains_exact(xs, ys, x, y) }}}
  *
  * The cheap bounding-box conjuncts short-circuit the O(vertices)
  * ray-cast for the overwhelmingly common non-matching join candidates —
  * the Spark analogue of the spatial index MobilityDB provides the
  * paper's Movable-Objects Query Engine (§5.2.3).
  *
  * Idempotent: the rewrite produces `StContainsExact`, which this rule
  * never matches. Only deterministic argument expressions are rewritten
  * (they get duplicated across conjuncts).
  */
object SpatialPrefilterRule extends Rule[LogicalPlan] {
  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformAllExpressions {
    case StContains(xs, ys, x, y)
        if Seq(xs, ys, x, y).forall(_.deterministic) =>
      val bboxX: Expression =
        And(GreaterThanOrEqual(x, ArrayMin(xs)), LessThanOrEqual(x, ArrayMax(xs)))
      val bboxY: Expression =
        And(GreaterThanOrEqual(y, ArrayMin(ys)), LessThanOrEqual(y, ArrayMax(ys)))
      And(And(bboxX, bboxY), StContainsExact(xs, ys, x, y))
  }
}
