package repro.catalyst

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.{BinaryExpression, Expression, QuaternaryExpression}
import org.apache.spark.sql.catalyst.expressions.codegen.CodegenFallback
import org.apache.spark.sql.catalyst.util.ArrayData
import org.apache.spark.sql.types.{BooleanType, DataType, DoubleType}
import repro.geom.Heading

/** Shared evaluation helpers for the spatial expressions. */
private[catalyst] object SpatialEval {
  def toD(a: Any): Double = a match {
    case d: Double => d
    case f: Float  => f.toDouble
    case n: Number => n.doubleValue()
    case other     => throw new IllegalArgumentException(s"not numeric: $other")
  }

  /** Ray-casting point-in-polygon over parallel coordinate arrays,
    * boundary-inclusive-ish (consistent with geom.Polygon but allocation
    * free — this runs per joined row in the query engine).
    */
  def contains(xs: Array[Double], ys: Array[Double], px: Double, py: Double): Boolean = {
    val n = math.min(xs.length, ys.length)
    if (n < 3) return false
    var inside = false
    var j      = n - 1
    var i      = 0
    while (i < n) {
      val xi = xs(i); val yi = ys(i); val xj = xs(j); val yj = ys(j)
      // Boundary tolerance: point on a horizontal/vertical edge.
      if ((yi > py) != (yj > py) && px < (xj - xi) * (py - yi) / (yj - yi) + xi) inside = !inside
      j = i
      i += 1
    }
    inside
  }
}

/** `st_contains(xs, ys, x, y)` — polygon (parallel double arrays) contains
  * ground point. Rewritten by SpatialPrefilterRule into a bbox check plus
  * `StContainsExact`; evaluable as-is when the rule has not run.
  */
case class StContains(xsE: Expression, ysE: Expression, xE: Expression, yE: Expression)
    extends QuaternaryExpression with CodegenFallback {
  override def first: Expression  = xsE
  override def second: Expression = ysE
  override def third: Expression  = xE
  override def fourth: Expression = yE
  override def dataType: DataType = BooleanType
  override def nullable: Boolean  = true
  override def prettyName: String = "st_contains"

  override def nullSafeEval(xs: Any, ys: Any, x: Any, y: Any): Any =
    SpatialEval.contains(xs.asInstanceOf[ArrayData].toDoubleArray(),
                         ys.asInstanceOf[ArrayData].toDoubleArray(),
                         SpatialEval.toD(x), SpatialEval.toD(y))

  override protected def withNewChildrenInternal(
      newFirst: Expression, newSecond: Expression,
      newThird: Expression, newFourth: Expression): Expression =
    copy(xsE = newFirst, ysE = newSecond, xE = newThird, yE = newFourth)
}

/** The exact-test half of a rewritten `st_contains`; never produced by the
  * parser, which makes the prefilter rule idempotent.
  */
case class StContainsExact(xsE: Expression, ysE: Expression, xE: Expression, yE: Expression)
    extends QuaternaryExpression with CodegenFallback {
  override def first: Expression  = xsE
  override def second: Expression = ysE
  override def third: Expression  = xE
  override def fourth: Expression = yE
  override def dataType: DataType = BooleanType
  override def nullable: Boolean  = true
  override def prettyName: String = "st_contains_exact"

  override def nullSafeEval(xs: Any, ys: Any, x: Any, y: Any): Any =
    SpatialEval.contains(xs.asInstanceOf[ArrayData].toDoubleArray(),
                         ys.asInstanceOf[ArrayData].toDoubleArray(),
                         SpatialEval.toD(x), SpatialEval.toD(y))

  override protected def withNewChildrenInternal(
      newFirst: Expression, newSecond: Expression,
      newThird: Expression, newFourth: Expression): Expression =
    copy(xsE = newFirst, ysE = newSecond, xE = newThird, yE = newFourth)
}

/** `st_distance(x1, y1, x2, y2)` — Euclidean ground-plane distance. */
case class StDistance(x1E: Expression, y1E: Expression, x2E: Expression, y2E: Expression)
    extends QuaternaryExpression with CodegenFallback {
  override def first: Expression  = x1E
  override def second: Expression = y1E
  override def third: Expression  = x2E
  override def fourth: Expression = y2E
  override def dataType: DataType = DoubleType
  override def nullable: Boolean  = true
  override def prettyName: String = "st_distance"

  override def nullSafeEval(x1: Any, y1: Any, x2: Any, y2: Any): Any = {
    val dx = SpatialEval.toD(x1) - SpatialEval.toD(x2)
    val dy = SpatialEval.toD(y1) - SpatialEval.toD(y2)
    math.sqrt(dx * dx + dy * dy)
  }

  override protected def withNewChildrenInternal(
      newFirst: Expression, newSecond: Expression,
      newThird: Expression, newFourth: Expression): Expression =
    copy(x1E = newFirst, y1E = newSecond, x2E = newThird, y2E = newFourth)
}

/** `heading_diff(a, b)` — absolute angular difference in [0, 180]. */
case class HeadingDiffExpr(left: Expression, right: Expression)
    extends BinaryExpression with CodegenFallback {
  override def dataType: DataType = DoubleType
  override def nullable: Boolean  = true
  override def prettyName: String = "heading_diff"

  override def nullSafeEval(a: Any, b: Any): Any =
    Heading.diff(SpatialEval.toD(a), SpatialEval.toD(b))

  override protected def withNewChildrenInternal(newLeft: Expression, newRight: Expression): Expression =
    copy(left = newLeft, right = newRight)
}

/** Registers the spatial functions and the prefilter optimizer rule on a
  * session (idempotent) — the paper's "spatial index" role in the
  * metadata store, realized through Catalyst extension points.
  */
object SpatialFunctions {
  def register(spark: SparkSession): Unit = synchronized {
    val reg = spark.sessionState.functionRegistry
    reg.createOrReplaceTempFunction("st_contains",
      exprs => StContains(exprs(0), exprs(1), exprs(2), exprs(3)), "scala_udf")
    reg.createOrReplaceTempFunction("st_contains_exact",
      exprs => StContainsExact(exprs(0), exprs(1), exprs(2), exprs(3)), "scala_udf")
    reg.createOrReplaceTempFunction("st_distance",
      exprs => StDistance(exprs(0), exprs(1), exprs(2), exprs(3)), "scala_udf")
    reg.createOrReplaceTempFunction("heading_diff",
      exprs => HeadingDiffExpr(exprs(0), exprs(1)), "scala_udf")
    if (!spark.experimental.extraOptimizations.contains(SpatialPrefilterRule))
      spark.experimental.extraOptimizations =
        spark.experimental.extraOptimizations :+ SpatialPrefilterRule
  }
}
