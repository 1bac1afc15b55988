package repro.exec

import org.apache.spark.sql.{DataFrame, functions => F}
import org.apache.spark.sql.functions.{col, lit}
import org.apache.spark.storage.StorageLevel

import repro.core.{AggPlan, KeyPartitioner, Mapping}

/** Executes an aggregation plan with real Spark jobs — step 9 of Fig. 5.
  *
  * State between phases is a DataFrame of partially-aggregated rows
  * `(fragment, __part, key, partial-state…)`. A phase relabels the
  * fragments of the scheduled `(src, partition)` shares to their receivers
  * and re-aggregates per (fragment, partition, key) — the Spark equivalent
  * of shipping a share across the network and folding it into the
  * receiver's hash table. Tuples moved between fragments are counted per
  * phase, so Table 2's "tuples received by the destination fragment" can be
  * measured on real data.
  */
object PlanExecutor {

  final case class ExecResult(
      result: DataFrame,
      tuplesMoved: Long,
      tuplesIntoDestinations: Long,
      phases: Int,
  )

  /** Run `plan` for the aggregation `SELECT key, aggs FROM df GROUP BY key`
    * where `df` has columns `(fragment, key, value-cols…)`.
    */
  def execute(
      df: DataFrame,
      specs: Seq[AggSpec],
      plan: AggPlan,
      mapping: Mapping,
      partitioner: KeyPartitioner,
  ): ExecResult = {
    require(specs.nonEmpty, "need at least one aggregate")
    val stateCols = specs.flatMap(_.stateCols)

    // Local pre-aggregation (step 2 of Fig. 5).
    var state = Fragments
      .withPartition(df, partitioner)
      .groupBy(col("fragment"), col("__part"), col("key"))
      .agg(specs.flatMap(_.partialExprs).head, specs.flatMap(_.partialExprs).tail: _*)
      .persist(StorageLevel.MEMORY_AND_DISK)

    var moved = 0L
    var intoDest = 0L

    plan.phases.foreach { phase =>
      // (src, partition) -> dst relabeling for this phase.
      val relabel = phase.transfers.map(t => (t.src.toLong * (1L << 20) + t.partition) -> t.dst).toMap
      val relabelUdf = F.udf((frag: Int, part: Int) =>
        relabel.getOrElse(frag.toLong * (1L << 20) + part, frag))

      val movedRows = state
        .withColumn("__dst", relabelUdf(col("fragment"), col("__part")))
        .filter(col("__dst") =!= col("fragment"))
        .groupBy(col("__dst"), col("__part"))
        .agg(F.count(lit(1)) as "__n")
        .collect()
      movedRows.foreach { r =>
        val dst = r.getInt(0); val part = r.getInt(1); val n = r.getLong(2)
        moved += n
        if (mapping(part) == dst) intoDest += n
      }

      val next = state
        .withColumn("fragment", relabelUdf(col("fragment"), col("__part")))
        .groupBy(col("fragment"), col("__part"), col("key"))
        .agg(specs.flatMap(_.mergeExprs).head, specs.flatMap(_.mergeExprs).tail: _*)
        .persist(StorageLevel.MEMORY_AND_DISK)
      next.count() // materialize before dropping the parent
      state.unpersist()
      state = next
    }

    // Completion check (Eq. 7): every share must sit at its destination.
    val destUdf = F.udf((part: Int) => mapping(part))
    val stragglers = state.filter(col("fragment") =!= destUdf(col("__part"))).count()
    require(stragglers == 0, s"plan incomplete: $stragglers rows off their destination")

    val result = state
      .groupBy(col("key"))
      .agg(
        specs.flatMap(_.mergeExprs).head, specs.flatMap(_.mergeExprs).tail: _*)
      .select(col("key") +: specs.map(_.finalExpr): _*)

    ExecResult(result, moved, intoDest, plan.numPhases)
  }

  /** The plain Spark aggregation the plans must agree with. */
  def direct(df: DataFrame, specs: Seq[AggSpec]): DataFrame =
    df.groupBy(col("key"))
      .agg(specs.flatMap(_.partialExprs).head, specs.flatMap(_.partialExprs).tail: _*)
      .select(col("key") +: specs.map(_.finalExpr): _*)
}
