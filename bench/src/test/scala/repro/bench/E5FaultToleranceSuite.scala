package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.E5FaultTolerance
import repro.sim.FaultSim

/** E5 / paper Fig. 16 — non-interrupted fault tolerance. Prints the
  * scenario table and the per-iteration fetch traces around injections.
  */
class E5FaultToleranceSuite extends AnyFunSuite {
  lazy val rows = E5FaultTolerance.run()

  test("Fig. 16 — fault-tolerance scenario table") {
    println(E5FaultTolerance.table(rows))
    println(E5FaultTolerance.summary(rows))
  }

  test("shape: a 4-deep prefetch buffer fully overlaps planner recovery") {
    assert(rows.find(_.scenario == "planner-fail buffer=4").get.spikes == 0)
  }

  test("shape: a 2-deep buffer spikes on every planner failure") {
    val r = rows.find(_.scenario == "planner-fail buffer=2").get
    assert(r.spikes >= 2 && r.maxFetch > 0.5)
  }

  test("shape: shadow loaders recover with no fetch spike, cold restore does not") {
    assert(rows.find(_.scenario == "loader-fail shadow").get.spikes == 0)
    assert(rows.find(_.scenario == "loader-fail cold-restore").get.spikes >= 1)
  }

  test("shape: total training time ranks shadow < cold restore") {
    val shadow = rows.find(_.scenario == "loader-fail shadow").get.totalTime
    val cold   = rows.find(_.scenario == "loader-fail cold-restore").get.totalTime
    assert(shadow < cold)
  }

  test("trace detail: buffer=2 spikes land at the injection steps") {
    val (cfg, tr) = E5FaultTolerance.plannerCase(2)
    val sp = FaultSim.spikes(tr, cfg)
    println(s"buffer=2 spike steps: $sp (injections at 20, 35, 50)")
    assert(sp.forall(s => Seq(20, 35, 50).exists(i => s >= i && s <= i + 4)))
  }
}
