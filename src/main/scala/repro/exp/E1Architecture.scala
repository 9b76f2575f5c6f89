package repro.exp

import repro.autoscale.{ResourcePool, SourcePartitioner}
import repro.costmodel.MemoryModel
import repro.costmodel.MemoryModel._
import repro.data.{DatasetGroup, SourceCatalog}
import scala.util.Random

/** E1 — data preprocessing architecture evaluation (paper Fig. 12,
  * Sec. 7.2): average memory per node and per-iteration data fetch
  * overhead for the Colocated loader vs OVERLORD-Vanilla (actor model, no
  * source partitioning, statically provisioned) vs OVERLORD-auto
  * (multi-level source partitioning + demand sizing), at the paper's two
  * cluster scales (Llama-12B + ViT-2B, bs = 72/GPU).
  *
  * Memory comes from `MemoryModel` (the paper's own simulated-backend
  * methodology); fetch overhead from a backlog queue simulation where
  * each architecture's worker pool drains the per-iteration
  * transformation demand of its batch share:
  *
  *  - Colocated: every rank's private loader must transform its DP
  *    group's full batch with its memory-bound worker count; at 576 GPUs
  *    (CP=4 doubles the per-DP batch) the pool runs at the edge and the
  *    Fig. 5 latency tail surfaces as fetch fluctuation.
  *  - OVERLORD-Vanilla: a fixed, user-provisioned actor pool with no
  *    mixture-driven scaling; adequate at 288 GPUs, it cannot absorb the
  *    doubled 576-GPU demand and fails to feed continuously.
  *  - OVERLORD-auto: the partitioner sizes per-source workers from
  *    journalized costs, so capacity tracks demand at both scales.
  *
  * A Spark-measured read-amplification microbenchmark backs the same
  * comparison at local scale (`loader.ColocatedBaseline`, E1 bench suite).
  */
object E1Architecture {

  final case class Scale(gpus: Int, tp: Int, pp: Int, cp: Int) {
    val topo: TrainTopo = TrainTopo(gpus, gpusPerNode = 16, tp = tp, cp = cp, pp = pp)
    def globalBatch: Int   = 72 * gpus
    def perDpBatch: Double = globalBatch.toDouble / topo.dp
  }
  val scale288: Scale = Scale(288, tp = 4, pp = 4, cp = 1)
  val scale576: Scale = Scale(576, tp = 4, pp = 4, cp = 4)

  val sizing: LoaderSizing = LoaderSizing(
    workers = 4, prefetchDepth = 2, bytesPerSample = 0.3 * MiB,
    workerFixed = 0.25 * GiB, actorFixed = 1.5 * GiB, ctorBufFactor = 4.0,
    plannerFixed = 1.0 * GiB)

  /** Non-loader per-node memory both architectures pay (trainer ranks,
    * RNG states, checkpoint staging — the other consumers of Fig. 4).
    */
  val trainerBasePerNode: Double = 120.0 * GiB

  /** Colocated worker count is memory-bound (Sec. 7.2): 4 workers for
    * 100 sources, a single worker for all 306.
    */
  def colocatedWorkers(group: DatasetGroup): Int = if (group.sources.size > 100) 1 else 4

  /** OVERLORD-Vanilla static provisioning: a few monolithic loader
    * actors, each worker process holding every source's reader state.
    */
  val vanillaActors  = 3
  val vanillaWorkers = 6

  val itersecs = 20.0

  // ------------------------------------------------------------------
  // Memory (Fig. 12 bars)
  // ------------------------------------------------------------------

  final case class MemRow(arch: String, perNodeGB: Double)

  def autoConfigs(s: Scale, group: DatasetGroup): Seq[repro.autoscale.LoaderConfig] =
    SourcePartitioner.partition(group, pool(s), partParams)

  def memoryRows(s: Scale, group: DatasetGroup): Seq[MemRow] = {
    val src  = SourceStates(group.fileStates)
    val base = trainerBasePerNode

    val colocSizing = sizing.copy(workers = colocatedWorkers(group))
    val coloc = colocatedPerNode(s.topo, colocSizing, src, s.perDpBatch) + base

    val vGroups = MemoryModel.vanillaGroups(src, vanillaActors, vanillaWorkers,
      totalStaged = s.globalBatch.toDouble).map(_.copy(statesPerWorker = true))
    val vanilla = overlordPerNode(s.topo, sizing, vGroups, s.perDpBatch) + base

    val cfgs    = autoConfigs(s, group)
    val stateOf = group.sources.map(x => x.name -> x.fileStateBytes).toMap
    val perActorStage = s.globalBatch.toDouble / math.max(1, cfgs.map(_.actors).sum)
    val aGroups = cfgs.map(c =>
      ActorGroup(stateOf(c.source), c.actors, c.workersPerActor, perActorStage))
    val auto = overlordPerNode(s.topo, sizing, aGroups, s.perDpBatch) + base

    Seq(MemRow("colocated", coloc / GiB), MemRow("overlord-vanilla", vanilla / GiB),
        MemRow("overlord-auto", auto / GiB))
  }

  def pool(s: Scale): ResourcePool = ResourcePool(
    totalCores = s.topo.nodes * 96.0 / 2, // sidecar gets half the host cores
    totalMemBytes = s.topo.nodes * 900.0 * GiB,
    constructorCores = s.topo.dp * 2.0, plannerCores = 4.0,
    podMemBytes = 200.0 * GiB)

  val partParams: SourcePartitioner.Params =
    SourcePartitioner.Params(clusterSize = 4, wSrc = 16, wActor = 4,
                             bufBytesPerWorker = 256.0 * 1024 * 1024)

  // ------------------------------------------------------------------
  // Fetch overhead (Fig. 12 lines): backlog queue over 100 iterations.
  // ------------------------------------------------------------------

  final case class FetchTrace(meanSec: Double, maxSec: Double, stalled: Boolean)

  def fetchSim(iters: Int, capacityCpuSec: Double, meanDemandCpuSec: Double,
               noiseSigma: Double = 0.35, seed: Long = 5): FetchTrace = {
    val rnd = new Random(seed)
    var backlog = 0.0
    var sum = 0.0; var mx = 0.0
    (0 until iters).foreach { _ =>
      val demand = meanDemandCpuSec * math.exp(rnd.nextGaussian() * noiseSigma)
      backlog = math.max(0.0, backlog + demand - capacityCpuSec)
      val fetch = backlog / math.max(1e-9, capacityCpuSec) * itersecs
      sum += fetch; mx = math.max(mx, fetch)
    }
    FetchTrace(sum / iters, mx, stalled = mx > itersecs)
  }

  def meanCost(group: DatasetGroup): Double =
    group.sources.map(_.transformSec).sum / group.sources.size

  /** (capacity, demand) in CPU-seconds per iteration, per architecture. */
  def regimes(s: Scale, group: DatasetGroup): Map[String, (Double, Double)] = {
    val mc = meanCost(group)
    val colocCap    = colocatedWorkers(group) * itersecs
    val colocDemand = s.perDpBatch * mc // per rank: its DP group's batch
    val vCap        = vanillaActors * vanillaWorkers * itersecs
    val vDemand     = s.globalBatch * mc
    val autoWorkers = autoConfigs(s, group).map(_.totalWorkers).sum
    val aCap        = math.min(autoWorkers.toDouble, pool(s).availableCores) * itersecs
    Map("colocated" -> (colocCap, colocDemand),
        "overlord-vanilla" -> (vCap, vDemand),
        "overlord-auto" -> (aCap, vDemand))
  }

  final case class Row(scale: Int, arch: String, memGB: Double, fetchMean: Double,
                       fetchMax: Double, stalled: Boolean)

  def run(group: DatasetGroup = SourceCatalog.navit100): Seq[Row] =
    Seq(scale288, scale576).flatMap { s =>
      val mem = memoryRows(s, group).map(r => r.arch -> r.perNodeGB).toMap
      val reg = regimes(s, group)
      Seq("colocated", "overlord-vanilla", "overlord-auto").map { arch =>
        val (cap, dem) = reg(arch)
        val t = fetchSim(100, cap, dem)
        Row(s.gpus, arch, mem(arch), t.meanSec, t.maxSec, t.stalled)
      }
    }

  def table(rows: Seq[Row]): String = {
    val body = rows.map(r => Seq(r.scale.toString, r.arch, Tables.f1(r.memGB),
      Tables.f2(r.fetchMean), Tables.f2(r.fetchMax), if (r.stalled) "yes" else "no"))
    Tables.render("E1 / Fig.12 — memory per node (GB) and data fetch overhead (s), navit-100",
      Seq("gpus", "architecture", "mem/node GB", "fetch mean s", "fetch max s", "stalls"), body)
  }

  def summary(rows: Seq[Row]): String = {
    def at(scale: Int, arch: String) = rows.find(r => r.scale == scale && r.arch == arch).get
    def red(scale: Int, arch: String) = at(scale, "colocated").memGB / at(scale, arch).memGB
    f"memory reduction vs colocated: 288 GPUs auto ${red(288, "overlord-auto")}%.1fx, " +
      f"vanilla ${red(288, "overlord-vanilla")}%.1fx; 576 GPUs auto ${red(576, "overlord-auto")}%.1fx, " +
      f"vanilla ${red(576, "overlord-vanilla")}%.1fx (paper: up to 13.5x). " +
      s"vanilla stalls at 576: ${at(576, "overlord-vanilla").stalled} " +
      s"(paper: vanilla failed to continuously feed at 576); " +
      s"auto stalls: ${at(576, "overlord-auto").stalled} (paper: no)"
  }
}
