package repro.rules

import org.apache.spark.sql.catalyst.expressions.{AttributeReference, EqualTo}
import org.apache.spark.sql.catalyst.plans.{Inner, LeftSemi}
import org.apache.spark.sql.catalyst.plans.logical.{Join, JoinHint, LogicalPlan, Project}
import org.apache.spark.sql.catalyst.rules.Rule

/** Catalyst analog of semi-join reduction / predicate transfer (§2.2, §4.5):
  * under every inner equi-join, the probe (left) side is first reduced with
  * a `LeftSemi` join on the same condition, so tuples that cannot find a
  * match are eliminated before the join materializes any intermediate
  * output — one step of the Yannakakis reduction, applied bottom-up by the
  * optimizer's fixpoint driver.
  *
  * The rewrite is purely semantic-preserving: `L ⋉θ R ⋈θ R ≡ L ⋈θ R`.
  * Inject via `spark.experimental.extraOptimizations`. Idempotent: a join
  * whose left side is already the matching semi-join is left untouched.
  */
object SemiJoinReduction extends Rule[LogicalPlan] {

  @annotation.tailrec
  private def stripProject(p: LogicalPlan): LogicalPlan = p match {
    case Project(_, child) => stripProject(child)
    case other             => other
  }

  private def alreadyReduced(left: LogicalPlan, cond: EqualTo): Boolean =
    stripProject(left) match {
      case Join(_, _, LeftSemi, Some(c), _) => c.semanticEquals(cond)
      case _                                => false
    }

  override def apply(plan: LogicalPlan): LogicalPlan = plan.transformUp {
    case j @ Join(l, r, Inner,
          Some(cond @ EqualTo(_: AttributeReference, _: AttributeReference)), _)
        if !alreadyReduced(l, cond) =>
      j.copy(left = Join(l, r, LeftSemi, Some(cond), JoinHint.NONE))
  }
}
