package repro.catalyst

import org.apache.spark.sql.catalyst.expressions.{Attribute, AttributeReference, AttributeSet}
import org.apache.spark.sql.catalyst.plans.logical.{LogicalPlan, UnaryNode}
import org.apache.spark.sql.types.{DataType, DoubleType, LongType}

import repro.exec.{AggFunc, AggSpec}

/** Logical plan node for a GRASP-scheduled aggregation:
  * `SELECT key, agg1, agg2 … FROM child GROUP BY key`, where the physical
  * execution merges the child's partitions in the similarity-driven order
  * chosen by the GRASP planner instead of a blind hash repartition.
  *
  * The node is injected below the analyzer (its child is already analyzed),
  * so it only needs to expose its schema; [[GraspStrategy]] turns it into
  * [[GraspAggregateExec]].
  */
final case class GraspAggregate(
    keyName: String,
    specs: Seq[AggSpec],
    outputAttrs: Seq[Attribute],
    child: LogicalPlan,
) extends UnaryNode {

  // The attributes are fixed at construction so that `copy`/transform keeps
  // the exprIds stable — downstream operators are resolved against them.
  override def output: Seq[Attribute] = outputAttrs

  // The operator consumes the key and every aggregate input column; without
  // this the optimizer's column pruning would see no references and strip
  // the child's output.
  override def references: AttributeSet = child.outputSet

  override protected def withNewChildInternal(newChild: LogicalPlan): GraspAggregate =
    copy(child = newChild)
}

object GraspAggregate {
  def resultType(spec: AggSpec): DataType = spec.func match {
    case AggFunc.Count => LongType
    case _             => DoubleType
  }

  /** Build the node with freshly minted result attributes. */
  def forChild(keyName: String, specs: Seq[AggSpec], child: LogicalPlan): GraspAggregate = {
    val keyAttr = child.output.find(_.name == keyName).getOrElse(
      throw new IllegalArgumentException(
        s"key column '$keyName' not found in ${child.output.map(_.name)}"))
    val attrs = keyAttr +: specs.map(s => AttributeReference(s.alias, resultType(s))())
    GraspAggregate(keyName, specs, attrs, child)
  }
}
