package repro.sim

import org.scalatest.funsuite.AnyFunSuite
import FetchSim._

class FetchSimSpec extends AnyFunSuite {

  def direct(n: Int): Config = Config(trainers = n, loaders = 306, constructors = 0)
  def ovld(n: Int): Config   = Config(trainers = n, loaders = 306, constructors = n / 64)

  test("direct latency grows with the trainer count") {
    val l1 = fetchLatency(direct(512)).latencySec
    val l2 = fetchLatency(direct(1024)).latencySec
    assert(l2 > l1)
  }

  test("the constructor path stays near-flat across scales") {
    val l1 = fetchLatency(ovld(1024)).latencySec
    val l4 = fetchLatency(ovld(4096)).latencySec
    assert(l4 < l1 * 2.0)
  }

  test("direct connection count is loaders x trainers") {
    assert(fetchLatency(direct(1024)).totalConnections == 306L * 1024)
  }

  test("constructors collapse the connection mesh") {
    val d = fetchLatency(direct(2048)).totalConnections
    val o = fetchLatency(ovld(2048)).totalConnections
    assert(o < d / 10)
  }

  test("overload produces a collapse, not a finite latency") {
    val r = fetchLatency(direct(4096))
    assert(r.collapsed && r.latencySec.isInfinity)
  }

  test("the constructor path survives where direct collapses") {
    assert(fetchLatency(direct(4096)).collapsed)
    assert(!fetchLatency(ovld(4096)).collapsed)
  }

  test("latency increases with per-trainer bytes") {
    val a = fetchLatency(direct(1024))
    val b = fetchLatency(direct(1024).copy(bytesPerTrainerPerStep = 200e6))
    assert(b.latencySec > a.latencySec)
  }

  test("more egress bandwidth reduces latency") {
    val a = fetchLatency(ovld(2048))
    val b = fetchLatency(ovld(2048).copy(egressBytesPerSec = 8e9))
    assert(b.latencySec < a.latencySec)
  }

  test("loader fanout reflects the serving tier") {
    assert(fetchLatency(direct(1024)).loaderFanout == 1024)
    assert(fetchLatency(ovld(1024)).loaderFanout == 16)
  }

  test("configs validate their counts") {
    intercept[IllegalArgumentException](Config(0, 1, 0))
    intercept[IllegalArgumentException](Config(1, 0, 0))
  }
}
