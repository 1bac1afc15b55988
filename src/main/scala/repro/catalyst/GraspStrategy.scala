package repro.catalyst

import org.apache.spark.sql.SparkSessionExtensions
import org.apache.spark.sql.catalyst.plans.logical.LogicalPlan
import org.apache.spark.sql.execution.{SparkPlan, SparkStrategy}

/** Planner strategy turning the logical [[GraspAggregate]] into the physical
  * [[GraspAggregateExec]]. Inject through
  * `spark.experimental.extraStrategies` (done automatically by
  * [[Grasp.enable]]) or through the [[GraspExtensions]] session-extensions
  * builder (`spark.sql.extensions=repro.catalyst.GraspExtensions`).
  */
object GraspStrategy extends SparkStrategy {
  override def apply(plan: LogicalPlan): Seq[SparkPlan] = plan match {
    case g: GraspAggregate =>
      GraspAggregateExec(g.keyName, g.specs, g.output, planLater(g.child)) :: Nil
    case _ => Nil
  }
}

/** `SparkSessionExtensions` builder for config-based injection. */
final class GraspExtensions extends (SparkSessionExtensions => Unit) {
  override def apply(ext: SparkSessionExtensions): Unit =
    ext.injectPlannerStrategy(_ => GraspStrategy)
}
