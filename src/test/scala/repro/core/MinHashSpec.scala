package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropChecks
import org.scalacheck.Gen

/** Unit tests for the minhash machinery of §3.3. */
class MinHashSpec extends AnyFunSuite with PropChecks {

  private val hasher = new MinHasher(numHashes = 100, seed = 42)

  test("empty signature is all-MaxValue and recognized as empty") {
    val sig = hasher.emptySignature
    assert(sig.length == 100)
    assert(sig.forall(_ == Long.MaxValue))
    assert(hasher.isEmptySignature(sig))
  }

  test("signature of a non-empty set is not the empty signature") {
    assert(!hasher.isEmptySignature(hasher.signature(Seq(1L, 2L, 3L))))
  }

  test("signature is insensitive to key order and duplicates") {
    val a = hasher.signature(Seq(5L, 1L, 9L, 1L, 5L))
    val b = hasher.signature(Seq(9L, 5L, 1L))
    assert(a.sameElements(b))
  }

  test("identical sets have estimated Jaccard exactly 1") {
    val s = hasher.signature(1L to 50L)
    assert(hasher.estimateJaccard(s, s.clone()) == 1.0)
  }

  test("two empty sets have estimated Jaccard 0 (so ESTCARD(∅,∅) = 0)") {
    assert(hasher.estimateJaccard(hasher.emptySignature, hasher.emptySignature) == 0.0)
  }

  test("disjoint large sets have low estimated Jaccard") {
    val s = hasher.signature(1L to 1000L)
    val t = hasher.signature(100001L to 101000L)
    assert(hasher.estimateJaccard(s, t) <= 0.1)
  }

  test("union signature equals signature of union (minhash union property)") {
    val a = (1L to 300L).toArray
    val b = (200L to 500L).toArray
    val direct = hasher.signature(a ++ b)
    val merged = hasher.union(hasher.signature(a), hasher.signature(b))
    assert(direct.sameElements(merged))
  }

  test("unionInto mutates the accumulator to the pairwise minimum") {
    val acc = hasher.signature(1L to 10L)
    val other = hasher.signature(5L to 20L)
    val expect = hasher.union(acc, other)
    hasher.unionInto(acc, other)
    assert(acc.sameElements(expect))
  }

  test("union with the empty signature is the identity") {
    val s = hasher.signature(1L to 40L)
    assert(hasher.union(s, hasher.emptySignature).sameElements(s))
  }

  test("estimate is within 15% of true Jaccard for half-overlapping 2k-sets") {
    // Satuluri & Parthasarathy: within 10% with 95% probability at n = 100;
    // this is one fixed draw so allow 15%.
    val a = (1L to 2000L).toArray
    val b = (1001L to 3000L).toArray
    val trueJ = KeySet.jaccard(a, b) // 1000 / 3000
    val estJ = hasher.estimateJaccard(hasher.signature(a), hasher.signature(b))
    assert(math.abs(estJ - trueJ) <= 0.15, s"est $estJ vs true $trueJ")
  }

  test("more hash functions tighten the estimate (n=400)") {
    val big = new MinHasher(numHashes = 400, seed = 9)
    val a = (1L to 2000L).toArray
    val b = (1001L to 3000L).toArray
    val trueJ = KeySet.jaccard(a, b)
    val estJ = big.estimateJaccard(big.signature(a), big.signature(b))
    assert(math.abs(estJ - trueJ) <= 0.10, s"est $estJ vs true $trueJ")
  }

  test("different seeds give different hash families") {
    val h2 = new MinHasher(numHashes = 100, seed = 43)
    assert(!hasher.signature(1L to 10L).sameElements(h2.signature(1L to 10L)))
  }

  test("hash values stay inside [0, Prime)") {
    forAllSampled(Gen.long) { x: Long =>
      val h = hasher.hash(0, x)
      assert(h >= 0 && h < MinHasher.Prime)
    }
  }

  test("signature arity mismatch is rejected") {
    val other = new MinHasher(numHashes = 16)
    intercept[IllegalArgumentException] {
      hasher.estimateJaccard(hasher.emptySignature, other.emptySignature)
    }
  }

  test("property: union signature is commutative and associative") {
    val gen = Gen.nonEmptyListOf(Gen.chooseNum(0L, 5000L))
    forAllSampled(gen, gen, gen) { (xs, ys, zs) =>
      val (a, b, c) = (hasher.signature(xs), hasher.signature(ys), hasher.signature(zs))
      assert(hasher.union(a, b).sameElements(hasher.union(b, a)))
      assert(
        hasher.union(hasher.union(a, b), c).sameElements(hasher.union(a, hasher.union(b, c))))
    }
  }

  test("property: union signature equals direct signature of concatenation") {
    val gen = Gen.listOf(Gen.chooseNum(0L, 100000L))
    forAllSampled(gen, gen) { (xs, ys) =>
      val direct = hasher.signature(xs ++ ys)
      val merged = hasher.union(hasher.signature(xs), hasher.signature(ys))
      assert(direct.sameElements(merged))
    }
  }
}
