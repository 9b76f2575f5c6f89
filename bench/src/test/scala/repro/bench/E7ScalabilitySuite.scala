package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.E7Scalability

/** E7 / paper Fig. 18 (Appendix B) — Data Constructor scalability at
  * 1k/2k/4k GPUs versus direct loader->trainer delivery.
  */
class E7ScalabilitySuite extends AnyFunSuite {
  lazy val rows = E7Scalability.run()

  def at(g: Int, arch: String) = rows.find(r => r.gpus == g && r.arch.startsWith(arch)).get

  test("Fig. 18 — fetch latency vs cluster scale") {
    println(E7Scalability.table(rows))
    println(E7Scalability.summary(rows))
    assert(rows.size == 6)
  }

  test("shape: modest gap at 1k GPUs") {
    val r = at(1024, "direct").latency / at(1024, "overlord").latency
    assert(r > 1.0 && r < 6.0, s"1k ratio $r")
  }

  test("shape: roughly 10x baseline latency increase at 2k GPUs") {
    val r = at(2048, "direct").latency / at(2048, "overlord").latency
    assert(r > 5.0 && r < 20.0, s"2k ratio $r")
  }

  test("shape: the direct baseline collapses at 4k while OVERLORD sustains") {
    assert(at(4096, "direct").collapsed)
    assert(!at(4096, "overlord").collapsed)
  }

  test("shape: OVERLORD latency stays near-flat from 1k to 4k") {
    assert(at(4096, "overlord").latency < at(1024, "overlord").latency * 2)
  }

  test("the constructor tier shrinks the connection mesh by orders of magnitude") {
    assert(at(2048, "direct").connections > at(2048, "overlord").connections * 20)
  }
}
