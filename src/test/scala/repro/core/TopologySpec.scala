package repro.core

import org.scalatest.funsuite.AnyFunSuite

class TopologySpec extends AnyFunSuite {

  test("uniform topology: one fragment per machine, symmetric bandwidth") {
    val t = Topology.uniform(4, bw = 100.0)
    assert(t.nFragments == 4 && t.nMachines == 4)
    for (s <- 0 until 4; d <- 0 until 4 if s != d) {
      assert(!t.sameMachine(s, d))
      assert(t.pairBandwidth(s, d) == 100.0)
    }
  }

  test("colocated topology groups fragments onto machines") {
    val t = Topology.colocated(2, 3, nicBw = 10.0, intraBw = 1000.0)
    assert(t.nFragments == 6 && t.nMachines == 2)
    assert(t.machineOf == Vector(0, 0, 0, 1, 1, 1))
    assert(t.sameMachine(0, 2) && !t.sameMachine(2, 3))
    assert(t.pairBandwidth(0, 2) == 1000.0)
    assert(t.pairBandwidth(2, 3) == 10.0)
  }

  test("bandwidth matrix matches pairBandwidth (rows = sender)") {
    val t = Topology.colocated(2, 2, nicBw = 5.0, intraBw = 50.0)
    val b = t.bandwidthMatrix
    assert(b(0)(1) == 50.0)
    assert(b(0)(2) == 5.0)
    assert(b(2)(3) == 50.0)
  }

  test("asymmetric NIC bandwidths use the minimum for cross-machine pairs") {
    val t = Topology(Vector(0, 1), nicUpBw = 4.0, nicDownBw = 9.0, intraBw = 100.0)
    assert(t.pairBandwidth(0, 1) == 4.0)
  }

  test("constants match the paper's measured numbers") {
    assert(Topology.OneGbps == 118.0 * 1024 * 1024)
    assert(ComputeModel.Measured.aggRawBw == 309.0 * 1024 * 1024)
    assert(ComputeModel.Measured.aggPreBw == 811.0 * 1024 * 1024)
  }

  test("invalid topologies are rejected") {
    intercept[IllegalArgumentException](Topology(Vector.empty, 1, 1, 1))
    intercept[IllegalArgumentException](Topology(Vector(0), 0, 1, 1))
  }
}
