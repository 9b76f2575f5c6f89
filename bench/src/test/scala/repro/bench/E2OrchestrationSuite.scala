package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.E2Orchestration

/** E2 / paper Fig. 13 — end-to-end orchestration throughput across
  * datasets, backbones, encoders and context lengths, for the three
  * scheduling baselines. Prints the full table plus the Sec. 7.3
  * aggregate comparison, and asserts the paper's shape claims.
  */
class E2OrchestrationSuite extends AnyFunSuite {

  lazy val cells = E2Orchestration.sweep()

  test("Fig. 13 — orchestration throughput table") {
    println(E2Orchestration.table(cells))
    println(E2Orchestration.summary(cells))
    assert(cells.size == 2 * 3 * 2 * 4)
  }

  test("shape: hybrid >= backbone >= vanilla in every configuration") {
    cells.foreach { c =>
      assert(c.backboneTps >= c.vanillaTps * 0.98, s"$c")
      assert(c.hybridTps >= c.backboneTps * 0.98, s"$c")
    }
  }

  test("shape: average hybrid speedup lands in the paper's band") {
    val avg = cells.map(_.hybridSpeedup).sum / cells.size
    // Paper: 1.77x average (up to 4.54x). Same regime, conservative sim.
    assert(avg > 1.3 && avg < 2.5, s"avg speedup $avg")
    assert(cells.map(_.hybridSpeedup).max > 1.8)
  }

  test("shape: longer contexts amplify the balancing gains") {
    val byCtx = cells.groupBy(_.ctx).view
      .mapValues(cs => cs.map(_.hybridSpeedup).sum / cs.size).toMap
    assert(byCtx(32768L) > byCtx(4096L),
      s"32k speedup ${byCtx(32768L)} should exceed 4k ${byCtx(4096L)}")
  }

  test("shape: hybrid adds gains over backbone-only (encoder balancing)") {
    val extra = cells.map(c => c.hybridTps / c.backboneTps)
    assert(extra.sum / extra.size > 1.0)
  }

  test("shape: a larger encoder widens the hybrid advantage (Sec. 7.3)") {
    def hybridExtra(enc: String): Double = {
      val cs = cells.filter(c => c.encoder == enc && c.backbone == "Llama-12B")
      cs.map(c => c.hybridTps / c.backboneTps).sum / cs.size
    }
    assert(hybridExtra("ViT-2B") >= hybridExtra("ViT-1B") * 0.98)
  }
}
