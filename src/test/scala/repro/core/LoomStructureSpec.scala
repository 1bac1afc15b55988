package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropChecks
import org.scalacheck.Gen

/** Structural properties of LOOM's locality-hierarchical trees. */
class LoomStructureSpec extends AnyFunSuite with PropChecks {

  private def planner(topo: Topology, dest: Int) =
    new LoomPlanner(topo, dest, leafCard = 100, rootCard = 300, tupleBytes = 8.0)

  test("property: every fragment reaches the destination through the parent chain") {
    val gen = for {
      machines <- Gen.chooseNum(1, 5)
      per <- Gen.chooseNum(1, 6)
      f <- Gen.chooseNum(1, 8)
      if machines * per >= 2
    } yield (machines, per, f)
    forAllSampled(gen) { case (machines, per, f) =>
      val topo = Topology.colocated(machines, per)
      val dest = (machines * per) / 2
      val parent = planner(topo, dest).buildParents(f)
      for (i <- 0 until topo.nFragments if i != dest) {
        val chain = Iterator.iterate(i)(parent(_)).takeWhile(_ != dest).toList
        assert(chain.size <= topo.nFragments, s"cycle from $i: $chain")
        assert(chain.distinct.size == chain.size, s"repeated node from $i")
      }
      assert(parent(dest) == -1)
    }
  }

  test("property: fan-in bound is respected inside machines and across heads") {
    val gen = Gen.zip(Gen.chooseNum(2, 5), Gen.chooseNum(2, 6), Gen.chooseNum(1, 4))
    forAllSampled(gen) { case (machines, per, f) =>
      val topo = Topology.colocated(machines, per)
      val parent = planner(topo, 0).buildParents(f)
      val childCount = parent.filter(_ >= 0).groupBy(identity).view.mapValues(_.length)
      childCount.foreach { case (p, c) =>
        // A node can parent up to f local children plus f heads.
        assert(c <= 2 * f, s"node $p has $c children for fan-in $f")
      }
    }
  }

  test("uniform topology degenerates to a flat f-ary tree") {
    val topo = Topology.uniform(9)
    val parent = planner(topo, 0).buildParents(2)
    // Every machine is a singleton: all nodes are heads under a binary tree.
    val depths = (0 until 9).map(i =>
      Iterator.iterate(i)(parent(_)).takeWhile(_ != 0).size)
    assert(depths.max == 3) // ceil(log2(9))
  }

  test("plan phase count equals tree depth") {
    val topo = Topology.colocated(3, 4)
    val loom = planner(topo, 0)
    for (f <- 1 to 5) {
      val parent = loom.buildParents(f)
      val maxDepth = (0 until 12).map(i =>
        Iterator.iterate(i)(parent(_)).takeWhile(_ != 0).size).max
      assert(loom.plan(f).numPhases == maxDepth, s"f=$f")
    }
  }

  test("modeledCost is positive and finite for all fan-ins") {
    val topo = Topology.colocated(4, 4)
    val loom = planner(topo, 0)
    for (f <- 1 to 15) {
      val c = loom.modeledCost(f)
      assert(c > 0 && c.isFinite, s"f=$f cost=$c")
    }
  }

  test("invalid configurations are rejected") {
    intercept[IllegalArgumentException](
      new LoomPlanner(Topology.uniform(1), 0, 10, 10, 8.0))
    intercept[IllegalArgumentException](
      new LoomPlanner(Topology.uniform(4), 0, 0, 10, 8.0))
    intercept[IllegalArgumentException](planner(Topology.uniform(4), 0).plan(0))
  }
}
