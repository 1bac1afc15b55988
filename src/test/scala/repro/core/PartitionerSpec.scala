package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropChecks
import org.scalacheck.Gen

class PartitionerSpec extends AnyFunSuite with PropChecks {

  test("Single maps everything to partition 0") {
    assert(KeyPartitioner.Single.numPartitions == 1)
    forAllSampled(Gen.long)(k => assert(KeyPartitioner.Single.partitionOf(k) == 0))
  }

  test("Hashed is deterministic and in range") {
    val p = KeyPartitioner.Hashed(7)
    forAllSampled(Gen.long) { k =>
      val l = p.partitionOf(k)
      assert(l >= 0 && l < 7)
      assert(l == p.partitionOf(k))
    }
  }

  test("Hashed is roughly balanced over a dense key range") {
    val p = KeyPartitioner.Hashed(8)
    val counts = new Array[Int](8)
    (0L until 80000L).foreach(k => counts(p.partitionOf(k)) += 1)
    counts.foreach(c => assert(math.abs(c - 10000) < 1500, counts.toSeq))
  }

  test("Weighted respects the weight vector") {
    val p = KeyPartitioner.Weighted(Vector(4.0, 1.0, 1.0, 1.0, 1.0))
    val counts = new Array[Int](5)
    (0L until 80000L).foreach(k => counts(p.partitionOf(k)) += 1)
    assert(math.abs(counts(0) - 40000) < 3000, counts.toSeq)
    (1 until 5).foreach(i => assert(math.abs(counts(i) - 10000) < 2000, counts.toSeq))
  }

  test("Weighted with equal weights behaves like balanced partitioning") {
    val p = KeyPartitioner.Weighted(Vector.fill(4)(1.0))
    val counts = new Array[Int](4)
    (0L until 40000L).foreach(k => counts(p.partitionOf(k)) += 1)
    counts.foreach(c => assert(math.abs(c - 10000) < 1500, counts.toSeq))
  }

  test("Weighted rejects bad weights") {
    intercept[IllegalArgumentException](KeyPartitioner.Weighted(Vector.empty))
    intercept[IllegalArgumentException](KeyPartitioner.Weighted(Vector(-1.0, 2.0)))
    intercept[IllegalArgumentException](KeyPartitioner.Weighted(Vector(0.0, 0.0)))
  }

  test("Weighted partition ids stay in range even for extreme keys") {
    val p = KeyPartitioner.Weighted(Vector(1.0, 2.0, 3.0))
    for (k <- Seq(Long.MinValue, Long.MaxValue, 0L, -1L, 1L)) {
      val l = p.partitionOf(k)
      assert(l >= 0 && l < 3)
    }
  }
}
