package repro.gas

import org.scalatest.funsuite.AnyFunSuite

class NetworkModelSpec extends AnyFunSuite {

  private val topo = GasTopology(4, masters = 100, replicas = 160, mirrors = 60,
    edgesPerPartition = Array(250L, 250L, 300L, 200L))

  test("iteration time decomposes into compute + communication") {
    val m = NetworkModel(edgeRate = 100.0, msgRate = 10.0, rttSeconds = 0.5)
    val (comp, comm) = m.split(topo)
    assert(comp == 3.0)               // 300 / 100
    assert(comm == 12.0 + 1.0)        // 120 msgs / 10 + 2 rounds * 0.5
    assert(m.iterationSeconds(topo) == comp + comm)
  }

  test("run time scales linearly with iterations") {
    val m = NetworkModel()
    assert(math.abs(m.runSeconds(topo, 10) - 10 * m.iterationSeconds(topo)) < 1e-12)
  }

  test("more mirrors cost more communication") {
    val m = NetworkModel()
    val worse = topo.copy(mirrors = 600)
    assert(m.iterationSeconds(worse) > m.iterationSeconds(topo))
  }

  test("higher RTT costs more, equally for every topology") {
    val a = NetworkModel(rttSeconds = 0.010)
    val b = NetworkModel(rttSeconds = 0.100)
    val delta = b.iterationSeconds(topo) - a.iterationSeconds(topo)
    assert(math.abs(delta - 2 * 0.09) < 1e-12)
  }

  test("imbalance (max edges) gates compute time") {
    val m = NetworkModel()
    val skewed = topo.copy(edgesPerPartition = Array(700L, 100L, 100L, 100L))
    assert(m.split(skewed)._1 > m.split(topo)._1)
  }

  test("topology derived quantities") {
    assert(topo.maxEdges == 300)
    assert(topo.replicationFactor == 1.6)
    assert(topo.messagesPerIteration == 120)
  }
}
