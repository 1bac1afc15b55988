package repro.catalyst

import org.apache.spark.sql.types.{DoubleType, LongType}

import repro.SparkSpec
import repro.exec.AggSpec

/** Logical-plan-level behaviour of the GraspAggregate node. */
class GraspAggregateLogicalSpec extends SparkSpec {

  private lazy val child = {
    import spark.implicits._
    Seq((1L, 2.0)).toDF("key", "v").queryExecution.analyzed
  }

  test("output schema: key passes through, aggregates get fresh attributes") {
    val node = GraspAggregate.forChild("key", Seq(AggSpec.sum("v", "s"), AggSpec.count("n")), child)
    assert(node.output.map(_.name) == Seq("key", "s", "n"))
    assert(node.output.map(_.dataType) == Seq(LongType, DoubleType, LongType))
    assert(node.output.head.exprId == child.output.head.exprId, "key attribute must flow through")
  }

  test("result types: COUNT is LongType, everything else DoubleType") {
    assert(GraspAggregate.resultType(AggSpec.count("n")) == LongType)
    assert(GraspAggregate.resultType(AggSpec.sum("v", "s")) == DoubleType)
    assert(GraspAggregate.resultType(AggSpec.avg("v", "a")) == DoubleType)
    assert(GraspAggregate.resultType(AggSpec.min("v", "m")) == DoubleType)
    assert(GraspAggregate.resultType(AggSpec.max("v", "m")) == DoubleType)
  }

  test("exprIds survive child replacement (withNewChildInternal)") {
    val node = GraspAggregate.forChild("key", Seq(AggSpec.sum("v", "s")), child)
    val replaced = node.withNewChildren(Seq(child))
    assert(replaced.output.map(_.exprId) == node.output.map(_.exprId))
  }

  test("references cover the whole child output (blocks column pruning)") {
    val node = GraspAggregate.forChild("key", Seq(AggSpec.sum("v", "s")), child)
    assert(node.references == node.child.outputSet)
  }

  test("missing key column is rejected") {
    intercept[IllegalArgumentException] {
      GraspAggregate.forChild("nope", Seq(AggSpec.sum("v", "s")), child)
    }
  }
}
