package repro.core.expr

import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.analysis.TypeCheckResult
import org.apache.spark.sql.catalyst.expressions.codegen.CodegenFallback
import org.apache.spark.sql.catalyst.expressions.{Cast, Expression, Literal}
import org.apache.spark.sql.catalyst.plans.logical.LogicalPlan
import org.apache.spark.sql.catalyst.rules.Rule
import org.apache.spark.sql.types.{DataType, DoubleType, NumericType}

/** One term of a user ranking function: slider weight plus the min-max
  * normalization bounds of the attribute.
  */
final case class ScoreTerm(weight: Double, min: Double, max: Double) {
  /** Degenerate terms contribute nothing to the score. */
  def degenerate: Boolean = weight == 0.0 || max <= min
}

/** Catalyst expression computing the QR2 user ranking score
  * `Σ wᵢ · (xᵢ − minᵢ) / (maxᵢ − minᵢ)` — the custom-expression extension
  * point of the reproduction (DESIGN.md §2, S9). Registered in the session
  * function registry as `qr2_score(w1, min1, max1, e1, w2, …)` by
  * [[repro.core.Reranker.registerExtensions]].
  */
case class LinearScore(children: Seq[Expression], terms: Seq[ScoreTerm])
    extends Expression
    with CodegenFallback {

  override def dataType: DataType = DoubleType

  /** Degenerate terms are skipped entirely (their children are never
    * evaluated — see [[eval]]), so only live terms drive nullability.
    */
  override def nullable: Boolean =
    children.lazyZip(terms).exists((c, t) => !t.degenerate && c.nullable)

  override def checkInputDataTypes(): TypeCheckResult =
    if (children.size != terms.size)
      TypeCheckResult.TypeCheckFailure(
        s"qr2_score: ${terms.size} terms but ${children.size} value expressions")
    else if (!children.forall(_.dataType.isInstanceOf[NumericType]))
      TypeCheckResult.TypeCheckFailure("qr2_score: every value expression must be numeric")
    else TypeCheckResult.TypeCheckSuccess

  override def eval(input: InternalRow): Any = {
    var s = 0.0
    var i = 0
    while (i < children.length) {
      val t = terms(i)
      if (!t.degenerate) { // degenerate terms contribute nothing; skip eval
        val v = children(i).eval(input)
        if (v == null) return null
        val d = v match {
          case n: Number                               => n.doubleValue()
          case dec: org.apache.spark.sql.types.Decimal => dec.toDouble
          case other                                   => other.toString.toDouble
        }
        s += t.weight * (d - t.min) / (t.max - t.min)
      }
      i += 1
    }
    s
  }

  override protected def withNewChildrenInternal(newChildren: IndexedSeq[Expression]): Expression =
    copy(children = newChildren)
}

object LinearScore {

  /** SQL builder: arguments come in (weight, min, max, value) quadruples,
    * the first three foldable literals.
    */
  def fromArguments(args: Seq[Expression]): LinearScore = {
    require(args.nonEmpty && args.size % 4 == 0,
      s"qr2_score expects (weight, min, max, value) quadruples, got ${args.size} arguments")
    val (terms, values) = args.grouped(4).map { quad =>
      val Seq(w, mn, mx, v) = quad
      (ScoreTerm(litDouble(w, "weight"), litDouble(mn, "min"), litDouble(mx, "max")),
       Cast(v, DoubleType))
    }.toSeq.unzip
    LinearScore(values, terms)
  }

  private def litDouble(e: Expression, what: String): Double = e match {
    case Literal(v: Number, _) => v.doubleValue()
    case Literal(v: org.apache.spark.sql.types.Decimal, _) => v.toDouble
    case other => throw new IllegalArgumentException(s"qr2_score: $what must be a literal, got $other")
  }
}

/** Optimizer rule (injected through `spark.experimental.extraOptimizations`)
  * that prunes degenerate terms — zero slider weight or a collapsed
  * normalization range — from [[LinearScore]] expressions, so the physical
  * plan never evaluates (or reads) attributes that cannot affect the order.
  * Pure: [[LinearScore.eval]] already skips degenerate terms without
  * touching their children, so dropping them changes neither results nor
  * null semantics.
  */
object SimplifyLinearScore extends Rule[LogicalPlan] {

  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformAllExpressions {
    case LinearScore(children, terms) if terms.exists(_.degenerate) =>
      val kept = children.lazyZip(terms).filter((_, t) => !t.degenerate)
      if (kept.isEmpty) Literal(0.0, DoubleType)
      else LinearScore(kept.map(_._1), kept.map(_._2))
  }
}
