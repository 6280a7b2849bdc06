package repro.catalyst

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.sql.catalyst.expressions._
import org.apache.spark.sql.catalyst.plans.logical.{Filter, LogicalPlan}
import org.apache.spark.sql.catalyst.rules.Rule

import repro.core.ChiRegistry

/** The filter–verification framework (§3.2) expressed as Catalyst predicate
  * pushdown: a logical-plan rule that rewrites
  *
  * {{{
  *   Filter(cp_mask(id, path, roi…, lv, uv) > T, child)
  * }}}
  *
  * into
  *
  * {{{
  *   Filter(chi_lower(…) > T  OR  (chi_upper(…) > T  AND  cp_mask_verify(…) > T), child)
  * }}}
  *
  * Catalyst's `Or`/`And` short-circuit, so per row: a lower bound above T
  * accepts the mask with no disk access (Case 2); an upper bound at or below
  * T rejects it with no disk access (Case 1, via the failed `And` guard); only
  * the uncertain band (Case 3) evaluates `cp_mask_verify`, which loads the
  * mask. `cp < T` is rewritten with the bound roles mirrored (§3.3). The rule
  * leaves `verifyOnly` expressions alone, so it is idempotent under the
  * optimizer's fixed-point execution.
  */
final case class ChiPushdownRule(registry: Broadcast[ChiRegistry]) extends Rule[LogicalPlan] {

  /** cp_mask children: (mask_id, path, x1, y1, x2, y2, lv, uv) — the bound
    * expressions take all but `path`.
    */
  private def boundChildren(cp: CpMaskExpr): Seq[Expression] =
    cp.children.head +: cp.children.drop(2)

  private def rewritable(cp: CpMaskExpr): Boolean = !cp.verifyOnly

  private def gt(cp: CpMaskExpr, t: Expression): Expression = {
    val lower = ChiBoundExpr(boundChildren(cp), registry, upper = false)
    val upper = ChiBoundExpr(boundChildren(cp), registry, upper = true)
    Or(
      GreaterThan(lower, t),
      And(GreaterThan(upper, t), GreaterThan(cp.copy(verifyOnly = true), t)),
    )
  }

  private def lt(cp: CpMaskExpr, t: Expression): Expression = {
    val lower = ChiBoundExpr(boundChildren(cp), registry, upper = false)
    val upper = ChiBoundExpr(boundChildren(cp), registry, upper = true)
    Or(
      LessThan(upper, t),
      And(LessThan(lower, t), LessThan(cp.copy(verifyOnly = true), t)),
    )
  }

  override def apply(plan: LogicalPlan): LogicalPlan = plan.transform {
    case f @ Filter(cond, _) =>
      val rewritten = cond.transformUp {
        // cp > T  /  T < cp
        case GreaterThan(cp: CpMaskExpr, t) if rewritable(cp) && t.deterministic => gt(cp, t)
        case LessThan(t, cp: CpMaskExpr) if rewritable(cp) && t.deterministic   => gt(cp, t)
        // cp < T  /  T > cp
        case LessThan(cp: CpMaskExpr, t) if rewritable(cp) && t.deterministic   => lt(cp, t)
        case GreaterThan(t, cp: CpMaskExpr) if rewritable(cp) && t.deterministic => lt(cp, t)
      }
      if (rewritten fastEquals cond) f else f.copy(condition = rewritten)
  }
}
