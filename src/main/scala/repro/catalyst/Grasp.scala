package repro.catalyst

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.classic

import repro.exec.AggSpec

/** User-facing API for the GRASP aggregation operator:
  *
  * {{{
  * val out = Grasp.aggregate(df, "key", Seq(AggSpec.sum("v", "sum_v")))
  * }}}
  *
  * builds `SELECT key, SUM(v) AS sum_v FROM df GROUP BY key` as a
  * [[GraspAggregate]] logical node and returns the DataFrame planned through
  * [[GraspStrategy]] / [[GraspAggregateExec]].
  */
object Grasp {

  /** Idempotently register the planner strategy on the session. */
  def enable(spark: SparkSession): Unit = {
    val cs = spark.asInstanceOf[classic.SparkSession]
    if (!cs.experimental.extraStrategies.contains(GraspStrategy))
      cs.experimental.extraStrategies = cs.experimental.extraStrategies :+ GraspStrategy
  }

  def aggregate(df: DataFrame, key: String, specs: Seq[AggSpec]): DataFrame = {
    require(specs.nonEmpty, "need at least one aggregate")
    val session = df.sparkSession.asInstanceOf[classic.SparkSession]
    enable(session)
    val analyzed = df.queryExecution.analyzed
    val cols = analyzed.output.map(_.name).toSet
    require(cols.contains(key), s"key column '$key' not in ${cols.mkString(", ")}")
    specs.foreach { s =>
      require(s.func == repro.exec.AggFunc.Count || cols.contains(s.input),
        s"aggregate input '${s.input}' not in ${cols.mkString(", ")}")
    }
    org.apache.spark.sql.repro.Bridge.ofRows(
      session, GraspAggregate.forChild(key, specs, analyzed))
  }
}
