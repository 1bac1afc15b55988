package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropChecks
import org.scalacheck.Gen

class KeySetSpec extends AnyFunSuite with PropChecks {

  test("fromUnsorted sorts and deduplicates") {
    assert(KeySet.fromUnsorted(Array(5L, 1L, 5L, 3L, 1L)).toSeq == Seq(1L, 3L, 5L))
  }

  test("fromUnsorted of empty input is empty") {
    assert(KeySet.fromUnsorted(Array.emptyLongArray).isEmpty)
  }

  test("fromUnsorted does not mutate its input") {
    val in = Array(3L, 1L, 2L)
    KeySet.fromUnsorted(in)
    assert(in.toSeq == Seq(3L, 1L, 2L))
  }

  test("fromRange produces the half-open range") {
    assert(KeySet.fromRange(2, 5).toSeq == Seq(2L, 3L, 4L))
    assert(KeySet.fromRange(2, 2).isEmpty)
  }

  test("union of overlapping ranges") {
    val a = KeySet.fromRange(0, 10)
    val b = KeySet.fromRange(5, 15)
    assert(KeySet.union(a, b).toSeq == (0L until 15L).toSeq)
  }

  test("union with empty is identity") {
    val a = KeySet.fromRange(0, 4)
    assert(KeySet.union(a, KeySet.empty).toSeq == a.toSeq)
    assert(KeySet.union(KeySet.empty, a).toSeq == a.toSeq)
  }

  test("intersectionSize and unionSize agree with set algebra") {
    val a = KeySet.fromRange(0, 100)
    val b = KeySet.fromRange(60, 160)
    assert(KeySet.intersectionSize(a, b) == 40)
    assert(KeySet.unionSize(a, b) == 160)
  }

  test("jaccard of identical, disjoint, and empty sets") {
    val a = KeySet.fromRange(0, 10)
    assert(KeySet.jaccard(a, a) == 1.0)
    assert(KeySet.jaccard(a, KeySet.fromRange(100, 110)) == 0.0)
    assert(KeySet.jaccard(KeySet.empty, KeySet.empty) == 0.0)
  }

  test("property: union matches scala Set union") {
    val gen = Gen.listOf(Gen.chooseNum(0L, 200L))
    forAllSampled(gen, gen) { (xs, ys) =>
      val a = KeySet.fromUnsorted(xs.toArray)
      val b = KeySet.fromUnsorted(ys.toArray)
      assert(KeySet.union(a, b).toSeq == (xs.toSet ++ ys.toSet).toSeq.sorted)
      assert(KeySet.intersectionSize(a, b) == (xs.toSet & ys.toSet).size.toLong)
    }
  }
}
