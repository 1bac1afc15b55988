package repro.exec

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.MinHasher

/** The Spark-side minhash aggregator must agree bit-for-bit with the
  * driver-side implementation regardless of how Spark partitions the data.
  */
class MinHashAggSpec extends SparkSpec {

  private val hasher = new MinHasher(numHashes = 64, seed = 7)

  test("signature from Spark equals driver-side signature") {
    import spark.implicits._
    val keys = (1L to 5000L).map(k => k * 13 % 2000)
    val df = keys.toDF("key").repartition(16)
    val row = df.agg(MinHashAgg.column(hasher, col("key")) as "sig").collect().head
    val got = row.getSeq[Long](0).toArray
    assert(got.sameElements(hasher.signature(keys)))
  }

  test("signature is independent of partitioning (merge = minhash union)") {
    import spark.implicits._
    val keys = (1L to 2000L).toSeq
    val one = keys.toDF("key").coalesce(1)
      .agg(MinHashAgg.column(hasher, col("key"))).collect().head.getSeq[Long](0)
    val many = keys.toDF("key").repartition(32)
      .agg(MinHashAgg.column(hasher, col("key"))).collect().head.getSeq[Long](0)
    assert(one == many)
  }

  test("per-group signatures via groupBy") {
    import spark.implicits._
    val df = Seq.tabulate(300)(i => (i % 3, i.toLong)).toDF("g", "key")
    val rows = df.groupBy($"g").agg(MinHashAgg.column(hasher, col("key")) as "sig").collect()
    assert(rows.length == 3)
    rows.foreach { r =>
      val g = r.getInt(0)
      val expected = hasher.signature((0 until 300).filter(_ % 3 == g).map(_.toLong))
      assert(r.getSeq[Long](1).toArray.sameElements(expected), s"group $g")
    }
  }

  test("empty input yields the empty signature") {
    import spark.implicits._
    val df = Seq.empty[Long].toDF("key")
    val row = df.agg(MinHashAgg.column(hasher, col("key"))).collect().head
    assert(hasher.isEmptySignature(row.getSeq[Long](0).toArray))
  }

  test("estimated Jaccard from Spark signatures matches exact within 15%") {
    import spark.implicits._
    val a = (1L to 3000L).toSeq
    val b = (1500L to 4500L).toSeq
    val df = (a.map(("a", _)) ++ b.map(("b", _))).toDF("s", "key").repartition(8)
    val sigs = df.groupBy($"s").agg(MinHashAgg.column(hasher, col("key")) as "sig")
      .collect().map(r => r.getString(0) -> r.getSeq[Long](1).toArray).toMap
    val est = hasher.estimateJaccard(sigs("a"), sigs("b"))
    val exact = 1501.0 / 4500.0
    assert(math.abs(est - exact) <= 0.15, s"est=$est exact=$exact")
  }
}
