package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.E6Ablation

/** E6 / paper Fig. 17 (Appendix A) — ablation of batch size, worker
  * count and cluster size on the memory cost ratio.
  */
class E6AblationSuite extends AnyFunSuite {
  lazy val rows = E6Ablation.sweep()

  def at(param: String, value: String, cpPp: String): Double =
    rows.find(r => r.param == param && r.value == value && r.cpPp == cpPp).get.ratio

  test("Fig. 17 — ablation table") {
    println(E6Ablation.table(rows))
    assert(rows.nonEmpty)
  }

  test("shape: larger batches raise OVERLORD's relative cost (Fig. 17b)") {
    assert(at("batch", "2048", "cp1/pp1") > at("batch", "512", "cp1/pp1"))
  }

  test("shape: more workers deepen colocated redundancy, helping OVERLORD (Fig. 17a)") {
    assert(at("workers", "16", "cp1/pp1") < at("workers", "4", "cp1/pp1"))
    assert(at("workers", "16", "cp4/pp4") < at("workers", "4", "cp4/pp4"))
  }

  test("shape: bigger clusters at low parallelism erode the savings (Fig. 17c)") {
    assert(at("nodes", "4096", "cp1/pp1") > at("nodes", "512", "cp1/pp1"))
  }

  test("shape: high CP/PP keeps OVERLORD cost-efficient at every cluster size") {
    Seq("512", "1024", "2048", "4096").foreach { n =>
      assert(at("nodes", n, "cp4/pp4") < 0.2, s"nodes=$n")
    }
  }
}
