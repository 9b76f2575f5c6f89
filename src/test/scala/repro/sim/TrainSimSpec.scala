package repro.sim

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{ClientPlaceTree, Planner}
import repro.costmodel.ModelConfigs
import repro.data.SourceCatalog
import repro.exp.Workload

class TrainSimSpec extends AnyFunSuite {
  val tree  = ClientPlaceTree(pp = 1, dp = 4, cp = 1, tp = 2)
  val bb    = ModelConfigs.Llama12B
  val enc   = ModelConfigs.ViT1B
  val ctx   = 8192L
  val nBins = 4

  def buf(seed: Int = 0) = Workload.stepBuffer(SourceCatalog.coyo700m, tree.dp, nBins, ctx, seed)

  test("simulation yields positive time, tokens and throughput") {
    val r = TrainSim.simulate(Planner.vanilla(buf(), tree, ctx, nBins), bb, enc)
    assert(r.iterTimeSec > 0 && r.tokens > 0 && r.throughputTokPerSec > 0)
  }

  test("tokens equal the plan's packed token count") {
    val p = Planner.vanilla(buf(), tree, ctx, nBins)
    assert(TrainSim.simulate(p, bb, enc).tokens == p.totalTokens)
  }

  test("gpu imbalance is at least 1") {
    val r = TrainSim.simulate(Planner.vanilla(buf(), tree, ctx, nBins), bb, enc)
    assert(r.gpuImbalance >= 1.0)
  }

  test("backbone balancing strictly helps or matches vanilla throughput") {
    val b = buf()
    val v = TrainSim.simulate(Planner.vanilla(b, tree, ctx, nBins), bb, enc)
    val s = TrainSim.simulate(Planner.backboneBalance(b, tree, ctx, nBins, bb), bb, enc)
    assert(s.throughputTokPerSec >= v.throughputTokPerSec * 0.999)
  }

  test("hybrid balancing helps or matches backbone balancing") {
    val b  = buf()
    val bo = TrainSim.simulate(Planner.backboneBalance(b, tree, ctx, nBins, bb), bb, enc)
    val hy = TrainSim.simulate(Planner.hybridBalance(b, tree, ctx, nBins, bb, enc), bb, enc)
    assert(hy.throughputTokPerSec >= bo.throughputTokPerSec * 0.999)
  }

  test("balancing reduces gpu imbalance on skewed data") {
    val b = buf()
    val v = TrainSim.simulate(Planner.vanilla(b, tree, ctx, nBins), bb, enc)
    val h = TrainSim.simulate(Planner.hybridBalance(b, tree, ctx, nBins, bb, enc), bb, enc)
    assert(h.gpuImbalance <= v.gpuImbalance)
  }

  test("faster hardware shortens iterations proportionally") {
    val p  = Planner.vanilla(buf(), tree, ctx, nBins)
    val r1 = TrainSim.simulate(p, bb, enc, flopsPerSec = 100e12)
    val r2 = TrainSim.simulate(p, bb, enc, flopsPerSec = 200e12)
    assert(math.abs(r1.iterTimeSec / r2.iterTimeSec - 2.0) < 1e-6)
  }

  test("pipeline parallelism adds the (p-1)/m bubble") {
    val ppTree = ClientPlaceTree(pp = 2, dp = 2, cp = 1, tp = 2)
    val b      = Workload.stepBuffer(SourceCatalog.coyo700m, 2, nBins, ctx, 0)
    val r      = TrainSim.simulate(Planner.vanilla(b, ppTree, ctx, nBins), bb, enc)
    assert(r.iterTimeSec > 0) // bubble factor applied without blowing up
  }

  test("max and min microbatch FLOPs bound each other") {
    val r = TrainSim.simulate(Planner.vanilla(buf(), tree, ctx, nBins), bb, enc)
    assert(r.maxMicrobatchFlops >= r.minMicrobatchFlops && r.minMicrobatchFlops > 0)
  }

  test("a bigger encoder slows iterations") {
    val p  = Planner.vanilla(buf(), tree, ctx, nBins)
    val r1 = TrainSim.simulate(p, bb, ModelConfigs.ViT1B)
    val r2 = TrainSim.simulate(p, bb, ModelConfigs.ViT2B)
    assert(r2.iterTimeSec > r1.iterTimeSec)
  }
}
