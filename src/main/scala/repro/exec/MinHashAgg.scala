package repro.exec

import org.apache.spark.sql.{Column, Encoder, Encoders}
import org.apache.spark.sql.catalyst.encoders.ExpressionEncoder
import org.apache.spark.sql.expressions.Aggregator
import org.apache.spark.sql.functions

import repro.core.MinHasher

/** Minhash signatures as a Spark typed [[Aggregator]] — step 2 of Fig. 5
  * ("partition, pre-aggregate and calculate minhash signatures") runs on the
  * compute nodes, i.e. inside Spark tasks, not on the driver.
  *
  * The aggregator folds every key of a group into a signature buffer and
  * merges partial buffers with the component-wise minimum, which is exactly
  * the minhash union property — so the result is identical no matter how
  * Spark splits and combines the group.
  */
final class MinHashAgg(hasher: MinHasher) extends Aggregator[Long, Array[Long], Array[Long]] {

  override def zero: Array[Long] = hasher.emptySignature

  override def reduce(buf: Array[Long], key: Long): Array[Long] = {
    hasher.add(buf, key)
    buf
  }

  override def merge(b1: Array[Long], b2: Array[Long]): Array[Long] = {
    hasher.unionInto(b1, b2)
    b1
  }

  override def finish(buf: Array[Long]): Array[Long] = buf

  override def bufferEncoder: Encoder[Array[Long]] = ExpressionEncoder[Array[Long]]()

  override def outputEncoder: Encoder[Array[Long]] = ExpressionEncoder[Array[Long]]()
}

object MinHashAgg {
  /** `minhash(keyColumn)` usable inside `DataFrame.agg`. */
  def column(hasher: MinHasher, keyCol: Column): Column =
    functions.udaf(new MinHashAgg(hasher), Encoders.scalaLong).apply(keyCol)
}
