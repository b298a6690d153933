package repro.kvs

import org.scalatest.funsuite.AnyFunSuite

class SimulatedKVSSpec extends AnyFunSuite {

  test("get returns the stored blob and tallies traffic") {
    val kvs = new SimulatedKVS(4)
    kvs.put(1L, Blob(100))
    kvs.put(2L, Blob(250))
    assert(kvs.get(1L).size == 100)
    assert(kvs.tally.requests == 1)
    assert(kvs.tally.bytes == 100)
    kvs.get(2L)
    assert(kvs.tally.requests == 2)
    assert(kvs.tally.bytes == 350)
  }

  test("get on a missing key fails") {
    val kvs = new SimulatedKVS(1)
    intercept[NoSuchElementException](kvs.get(7L))
  }

  test("multiGet tallies every request") {
    val kvs = new SimulatedKVS(2)
    (0 until 10).foreach(i => kvs.put(i.toLong, Blob(10)))
    kvs.multiGet((0 until 10).map(_.toLong))
    assert(kvs.tally.requests == 10)
    assert(kvs.tally.bytes == 100)
  }

  test("placement spreads keys across nodes") {
    val kvs = new SimulatedKVS(8)
    (0 until 1000).foreach(i => kvs.put(i.toLong, Blob(1)))
    kvs.multiGet((0 until 1000).map(_.toLong))
    val perNode = kvs.requestsPerNode
    assert(perNode.sum == 1000)
    assert(perNode.forall(_ > 50), s"imbalanced placement: $perNode")
  }

  test("stored stats reflect puts") {
    val kvs = new SimulatedKVS(1)
    kvs.put(1L, Blob(100))
    kvs.put(1L, Blob(200)) // overwrite
    kvs.put(2L, Blob(50))
    assert(kvs.storedObjects == 2)
    assert(kvs.storedBytes == 250)
  }

  test("cost model: request-dominated traffic matches rtt") {
    val cm = CostModel(rttMs = 0.65, bandwidthMBps = 1e9, scanMBps = 1e9)
    assert(math.abs(cm.timeSecs(100000, 0) - 65.0) < 1e-6)
  }

  test("cost model: byte-dominated traffic matches bandwidth+scan") {
    val cm = CostModel(rttMs = 0, bandwidthMBps = 100, scanMBps = 400)
    val bytes = 100L * 1048576 // 100 MB
    val expect = (1.0 + 0.25) * 1000 // seconds→ms: 1 s transfer + 0.25 s scan
    assert(math.abs(cm.timeMs(0, bytes) - expect) / expect < 0.01)
  }

  test("cost model is monotone in requests and bytes") {
    val cm = CostModel()
    assert(cm.timeMs(10, 100) < cm.timeMs(11, 100))
    assert(cm.timeMs(10, 100) < cm.timeMs(10, 200))
  }

  test("tally reset clears counters") {
    val t = new Tally
    t.add(5, 100)
    t.reset()
    assert(t.requests == 0 && t.bytes == 0)
  }
}
