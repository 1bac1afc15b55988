package repro.catalyst

import scala.collection.mutable

import org.apache.spark.{NarrowDependency, Partition, TaskContext}
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.catalyst.InternalRow
import org.apache.spark.sql.catalyst.expressions.{Attribute, GenericInternalRow, UnsafeProjection}
import org.apache.spark.sql.execution.{SparkPlan, UnaryExecNode}
import org.apache.spark.sql.execution.metric.{SQLMetric, SQLMetrics}
import org.apache.spark.sql.types._
import org.apache.spark.storage.StorageLevel

import repro.core.{GraspPlanner, KeyPartitioner, Mapping, MinHasher, PlannerState}
import repro.exec.{AggFunc, AggSpec}

/** Mutable aggregation-state algebra over a flat `Array[Double]` — the
  * per-key hash-table payload the operator carries between merge phases.
  * NaN input values are treated as SQL NULLs (skipped by everything except
  * COUNT(*)).
  */
final class AggStateOps(specs: Seq[AggSpec]) extends Serializable {
  import AggFunc._

  private val slots: Array[Int] = specs.map {
    case AggSpec(Avg, _, _) => 2
    case _                  => 1
  }.toArray
  private val offsets: Array[Int] = slots.scanLeft(0)(_ + _).init
  val totalSlots: Int = slots.sum
  private val funcs: Array[AggFunc] = specs.map(_.func).toArray

  def newState(): Array[Double] = {
    val st = new Array[Double](totalSlots)
    var i = 0
    while (i < funcs.length) {
      funcs(i) match {
        case Min => st(offsets(i)) = Double.PositiveInfinity
        case Max => st(offsets(i)) = Double.NegativeInfinity
        case _   => ()
      }
      i += 1
    }
    st
  }

  /** Fold one input row's values (one per spec, NaN = NULL) into `st`. */
  def update(st: Array[Double], values: Array[Double]): Unit = {
    var i = 0
    while (i < funcs.length) {
      val o = offsets(i)
      val v = values(i)
      funcs(i) match {
        case Count             => st(o) += 1
        case _ if v.isNaN      => ()
        case Sum               => st(o) += v
        case Min               => if (v < st(o)) st(o) = v
        case Max               => if (v > st(o)) st(o) = v
        case Avg               => st(o) += v; st(o + 1) += 1
      }
      i += 1
    }
  }

  /** Merge state `b` into `a` (associative + commutative). */
  def merge(a: Array[Double], b: Array[Double]): Unit = {
    var i = 0
    while (i < funcs.length) {
      val o = offsets(i)
      funcs(i) match {
        case Sum | Count => a(o) += b(o)
        case Min         => if (b(o) < a(o)) a(o) = b(o)
        case Max         => if (b(o) > a(o)) a(o) = b(o)
        case Avg         => a(o) += b(o); a(o + 1) += b(o + 1)
      }
      i += 1
    }
  }

  /** Finalized value of spec `i` (Long for COUNT, Double otherwise). */
  def finalValue(st: Array[Double], i: Int): Any = funcs(i) match {
    case Count => st(offsets(i)).toLong
    case Avg   => if (st(offsets(i) + 1) == 0) null else st(offsets(i)) / st(offsets(i) + 1)
    case Min   => if (st(offsets(i)).isPosInfinity) null else st(offsets(i))
    case Max   => if (st(offsets(i)).isNegInfinity) null else st(offsets(i))
    case Sum   => st(offsets(i))
  }
}

/** One GRASP phase as a narrow RDD transformation.
  *
  * Partition `p` of this RDD holds fragment `p`'s hash table after the
  * phase: its previous contents minus the shares it sent away, plus the
  * shares scheduled to arrive, merged key-by-key. The dependency set is
  * exactly the scheduled transfers, so the "network" of the paper becomes
  * the partition-to-partition edges of the DAG, and `movedMetric` counts
  * the tuples that crossed fragments.
  */
/** Partition of a [[MergePhaseRDD]]: the fragment's own parent partition
  * plus the parent partitions scheduled to arrive this phase (captured on
  * the driver — parent `partitions` arrays are not available on executors).
  */
private final class MergePhasePartition(
    override val index: Int,
    val own: Partition,
    val incoming: Array[(Partition, Int)], // (src parent partition, data partition l)
) extends Partition

final class MergePhaseRDD(
    prev: RDD[(Int, Long, Array[Double])],
    sends: Map[(Int, Int), Int], // (srcFragment, partition) -> dstFragment
    ops: AggStateOps,
    movedMetric: SQLMetric,
) extends RDD[(Int, Long, Array[Double])](
      prev.sparkContext,
      Seq(new NarrowDependency(prev) {
        private val parentsOf: Map[Int, Seq[Int]] =
          sends.toSeq.groupBy(_._2).map { case (d, xs) => d -> xs.map(_._1._1) }
        override def getParents(pid: Int): Seq[Int] =
          (pid +: parentsOf.getOrElse(pid, Nil)).distinct
      })) {

  private val receivesByDst: Map[Int, Seq[(Int, Int)]] =
    sends.toSeq.map { case ((s, l), d) => d -> (s, l) }.groupBy(_._1)
      .map { case (d, xs) => d -> xs.map(_._2) }

  override def getPartitions: Array[Partition] = {
    val parents = prev.partitions
    Array.tabulate(parents.length) { pid =>
      val incoming = receivesByDst.getOrElse(pid, Nil)
        .map { case (s, l) => (parents(s), l) }.toArray
      new MergePhasePartition(pid, parents(pid), incoming)
    }
  }

  override def compute(split: Partition, ctx: TaskContext): Iterator[(Int, Long, Array[Double])] = {
    val part = split.asInstanceOf[MergePhasePartition]
    val pid = part.index
    val parent = firstParent[(Int, Long, Array[Double])]
    val table = new mutable.HashMap[(Int, Long), Array[Double]]
    // Own rows, minus the shares this fragment ships out this phase.
    parent.iterator(part.own, ctx).foreach { case (l, k, st) =>
      if (!sends.contains((pid, l))) table.put((l, k), st.clone())
    }
    // Arriving shares, merged into the local hash table (Eq. 1 / Eq. 6).
    part.incoming.foreach { case (srcPart, l) =>
      parent.iterator(srcPart, ctx).foreach { case (l2, k, st) =>
        if (l2 == l) {
          movedMetric.add(1)
          table.get((l, k)) match {
            case Some(acc) => ops.merge(acc, st)
            case None      => table.put((l, k), st.clone())
          }
        }
      }
    }
    table.iterator.map { case ((l, k), st) => (l, k, st) }
  }
}

/** Physical operator executing `GROUP BY key` with GRASP-scheduled partition
  * merges (the reproduction target: "a custom Catalyst physical operator …
  * that reorders partition merges based on distribution similarity").
  *
  * Execution:
  *   1. partial hash aggregation per child partition (= plan fragment);
  *   2. per-(fragment, hash-partition) cardinality + minhash statistics,
  *      collected to the driver (step 2–3 of Fig. 5);
  *   3. GRASP planning over those statistics (steps 4–8);
  *   4. one [[MergePhaseRDD]] per phase (step 9), each materialized and
  *      cached so a share is computed exactly once;
  *   5. projection of the final hash tables to unsafe rows.
  *
  * SQL metrics expose the phase count and the tuples moved between
  * fragments — the operator-level analogue of Table 2's "tuples received".
  */
final case class GraspAggregateExec(
    keyName: String,
    specs: Seq[AggSpec],
    outputAttrs: Seq[Attribute],
    child: SparkPlan,
) extends UnaryExecNode {

  override def output: Seq[Attribute] = outputAttrs

  // The aggregate result attributes are minted by this operator (only the
  // key flows through from the child).
  override def producedAttributes: org.apache.spark.sql.catalyst.expressions.AttributeSet =
    org.apache.spark.sql.catalyst.expressions.AttributeSet(
      outputAttrs.filterNot(a => child.output.exists(_.exprId == a.exprId)))

  override lazy val metrics: Map[String, SQLMetric] = Map(
    "numPhases"   -> SQLMetrics.createMetric(sparkContext, "GRASP phases"),
    "tuplesMoved" -> SQLMetrics.createMetric(sparkContext, "tuples moved between fragments"),
    "numOutputRows" -> SQLMetrics.createMetric(sparkContext, "number of output rows"),
  )

  override protected def withNewChildInternal(newChild: SparkPlan): GraspAggregateExec =
    copy(child = newChild)

  private def toDouble(row: InternalRow, ord: Int, dt: DataType): Double =
    if (ord < 0 || row.isNullAt(ord)) Double.NaN
    else dt match {
      case DoubleType  => row.getDouble(ord)
      case FloatType   => row.getFloat(ord).toDouble
      case LongType    => row.getLong(ord).toDouble
      case IntegerType => row.getInt(ord).toDouble
      case ShortType   => row.getShort(ord).toDouble
      case d: DecimalType => row.getDecimal(ord, d.precision, d.scale).toDouble
      case other => throw new IllegalArgumentException(s"unsupported aggregate input type $other")
    }

  override protected def doExecute(): RDD[InternalRow] = {
    val childOutput = child.output
    val keyOrd = childOutput.indexWhere(_.name == keyName)
    require(keyOrd >= 0, s"key column $keyName missing from child output")
    val keyType = childOutput(keyOrd).dataType
    require(keyType == LongType || keyType == IntegerType,
      s"GROUP BY key must be integral, got $keyType")
    val inOrds = specs.map {
      case AggSpec(AggFunc.Count, _, _) => -1
      case s =>
        val o = childOutput.indexWhere(_.name == s.input)
        require(o >= 0, s"aggregate input column ${s.input} missing from child output")
        o
    }.toArray
    val inTypes = inOrds.map(o => if (o < 0) NullType else childOutput(o).dataType)

    val ops = new AggStateOps(specs)
    val childRdd = child.execute()
    val n = childRdd.getNumPartitions
    if (n == 0) return sparkContext.emptyRDD[InternalRow]

    val partitioner = KeyPartitioner.Hashed(n)
    val nSpecs = specs.size
    val keyIsLong = keyType == LongType
    val keyOrdB = keyOrd
    val inOrdsB = inOrds
    val inTypesB = inTypes
    val toDoubleFn = (row: InternalRow, i: Int) => toDouble(row, inOrdsB(i), inTypesB(i))

    // --- 1. local partial aggregation per fragment (Fig. 5 step 2).
    val local: RDD[(Int, Long, Array[Double])] = childRdd.mapPartitions { rows =>
      val table = new mutable.HashMap[(Int, Long), Array[Double]]
      val values = new Array[Double](nSpecs)
      rows.foreach { row =>
        if (!row.isNullAt(keyOrdB)) {
          val key = if (keyIsLong) row.getLong(keyOrdB) else row.getInt(keyOrdB).toLong
          var i = 0
          while (i < nSpecs) { values(i) = toDoubleFn(row, i); i += 1 }
          val st = table.getOrElseUpdate(
            (partitioner.partitionOf(key), key), ops.newState())
          ops.update(st, values)
        }
      }
      table.iterator.map { case ((l, k), st) => (l, k, st) }
    }
    local.persist(StorageLevel.MEMORY_AND_DISK)

    // --- 2. statistics: cardinality + minhash per (fragment, partition).
    val hasher = new MinHasher(MinHasher.PaperHashes, seed = 42)
    val statRows = local.mapPartitionsWithIndex { (pid, it) =>
      val card = new Array[Long](n)
      val sigs = Array.fill(n)(hasher.emptySignature)
      it.foreach { case (l, k, _) => card(l) += 1; hasher.add(sigs(l), k) }
      Iterator.single((pid, card, sigs))
    }.collect()
    val card = Array.fill(n, n)(0L)
    val sigs = Array.fill(n, n)(hasher.emptySignature)
    statRows.foreach { case (pid, c, s) => card(pid) = c; sigs(pid) = s }

    // --- 3. GRASP planning (steps 3-8 of Fig. 5). The operator has no real
    // network, so the bandwidth matrix is uniform.
    val stats = PlannerState.fromStats(card, sigs, hasher)
    val mapping = Mapping.allToAll(n)
    val bw = Array.fill(n, n)(1.0)
    val plan = new GraspPlanner(stats, bw, mapping, tupleBytes = 16.0).plan()
    longMetric("numPhases").add(plan.numPhases)

    // --- 4. one narrow merge step per phase, each materialized once.
    val moved = longMetric("tuplesMoved")
    var state = local
    plan.phases.foreach { phase =>
      val sends = phase.transfers.map(t => (t.src, t.partition) -> t.dst).toMap
      val next = new MergePhaseRDD(state, sends, ops, moved)
      next.persist(StorageLevel.MEMORY_AND_DISK)
      next.count()
      state.unpersist(blocking = false)
      state = next
    }

    // --- 5. project the destination hash tables to output rows.
    val outTypes = outputAttrs.map(_.dataType).toArray
    val numOutput = longMetric("numOutputRows")
    state.mapPartitions { it =>
      val proj = UnsafeProjection.create(outTypes)
      val row = new GenericInternalRow(1 + nSpecs)
      it.map { case (_, k, st) =>
        if (keyIsLong) row.update(0, k) else row.update(0, k.toInt)
        var i = 0
        while (i < nSpecs) { row.update(1 + i, ops.finalValue(st, i)); i += 1 }
        numOutput.add(1)
        proj.apply(row).copy()
      }
    }
  }
}
