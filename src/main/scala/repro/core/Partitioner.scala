package repro.core

/** The repartition function that maps a GROUP BY key to its partition
  * `l ∈ L` (§2.2). The same function must be applied on the Spark side (as a
  * UDF) and on the driver side (building simulator inputs), so it lives in
  * core and is pure.
  */
sealed trait KeyPartitioner extends Serializable {
  def numPartitions: Int
  def partitionOf(key: Long): Int
}

object KeyPartitioner {

  /** The all-to-one "partitioner": a single partition. */
  case object Single extends KeyPartitioner {
    val numPartitions = 1
    def partitionOf(key: Long): Int = 0
  }

  /** Balanced hash partitioning, the default all-to-all repartition
    * function ("aggregation results are evenly balanced across all nodes",
    * §5.1).
    */
  final case class Hashed(numPartitions: Int) extends KeyPartitioner {
    require(numPartitions > 0)
    def partitionOf(key: Long): Int = {
      val mixed = key ^ (key >>> 33)
      (((mixed * 0x9E3779B97F4A7C15L) >>> 33) % numPartitions).toInt
    }
  }

  /** Weighted hash partitioning — §5.2.3 changes "the repartition function
    * to assign more tuples to fragment 0". `weights` need not be
    * normalized.
    */
  final case class Weighted(weights: Vector[Double]) extends KeyPartitioner {
    require(weights.nonEmpty && weights.forall(_ >= 0) && weights.sum > 0, "bad weights")
    val numPartitions: Int = weights.size
    private val Buckets = 1 << 20
    private val cumulative: Array[Long] = {
      val total = weights.sum
      val cum = weights.scanLeft(0.0)(_ + _).tail
      cum.map(c => math.round(c / total * Buckets)).toArray
    }
    def partitionOf(key: Long): Int = {
      val mixed = key ^ (key >>> 33)
      val bucket = ((mixed * 0x9E3779B97F4A7C15L) >>> 33) % Buckets
      val idx = java.util.Arrays.binarySearch(cumulative, bucket + 1)
      val p = if (idx >= 0) idx else -idx - 1
      math.min(p, numPartitions - 1)
    }
  }
}
