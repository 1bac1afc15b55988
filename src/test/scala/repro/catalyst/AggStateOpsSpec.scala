package repro.catalyst

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.PropChecks
import repro.exec.AggSpec

/** The operator's aggregation-state algebra: associativity/commutativity of
  * merge (required for GRASP to combine fragments in any order) and SQL
  * NULL semantics.
  */
class AggStateOpsSpec extends AnyFunSuite with PropChecks {

  private val specs = Seq(
    AggSpec.sum("v", "s"), AggSpec.min("v", "mn"), AggSpec.max("v", "mx"),
    AggSpec.count("c"), AggSpec.avg("v", "a"))
  private val ops = new AggStateOps(specs)

  private def stateOf(values: Seq[Double]): Array[Double] = {
    val st = ops.newState()
    values.foreach(v => ops.update(st, Array(v, v, v, v, v)))
    st
  }

  test("fresh state finalizes to neutral values") {
    val st = ops.newState()
    assert(ops.finalValue(st, 0) == 0.0)  // SUM
    assert(ops.finalValue(st, 1) == null) // MIN of nothing
    assert(ops.finalValue(st, 2) == null) // MAX of nothing
    assert(ops.finalValue(st, 3) == 0L)   // COUNT(*)
    assert(ops.finalValue(st, 4) == null) // AVG of nothing
  }

  test("single update finalizes to the value itself") {
    val st = stateOf(Seq(7.0))
    assert(ops.finalValue(st, 0) == 7.0)
    assert(ops.finalValue(st, 1) == 7.0)
    assert(ops.finalValue(st, 2) == 7.0)
    assert(ops.finalValue(st, 3) == 1L)
    assert(ops.finalValue(st, 4) == 7.0)
  }

  test("NaN input is NULL: skipped by everything except COUNT(*)") {
    val st = ops.newState()
    ops.update(st, Array(Double.NaN, Double.NaN, Double.NaN, Double.NaN, Double.NaN))
    assert(ops.finalValue(st, 0) == 0.0)
    assert(ops.finalValue(st, 1) == null)
    assert(ops.finalValue(st, 3) == 1L)
    assert(ops.finalValue(st, 4) == null)
  }

  test("property: merge equals concatenated updates (associativity)") {
    val gen = Gen.listOf(Gen.chooseNum(-100.0, 100.0))
    forAllSampled(gen, gen) { (xs, ys) =>
      val merged = stateOf(xs)
      ops.merge(merged, stateOf(ys))
      val together = stateOf(xs ++ ys)
      merged.zip(together).foreach { case (a, b) =>
        // SUM slots accumulate in different order: compare up to fp noise.
        assert(math.abs(a - b) <= 1e-9 * math.max(1.0, math.abs(b)), s"xs=$xs ys=$ys")
      }
    }
  }

  test("property: merge is commutative") {
    val gen = Gen.nonEmptyListOf(Gen.chooseNum(-50.0, 50.0))
    forAllSampled(gen, gen) { (xs, ys) =>
      val ab = stateOf(xs); ops.merge(ab, stateOf(ys))
      val ba = stateOf(ys); ops.merge(ba, stateOf(xs))
      // SUM/AVG accumulate in different order: compare finalized values.
      specs.indices.foreach { i =>
        (ops.finalValue(ab, i), ops.finalValue(ba, i)) match {
          case (x: Double, y: Double) => assert(math.abs(x - y) < 1e-9)
          case (x, y) => assert(x == y)
        }
      }
    }
  }

  test("state slots: AVG takes two, everything else one") {
    assert(ops.totalSlots == 6)
  }
}
