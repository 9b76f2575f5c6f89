package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PrimitivesSpec extends AnyFunSuite {
  val tree = ClientPlaceTree(pp = 1, dp = 4, cp = 1, tp = 2)

  def metas(n: Int, seed: Long = 1): Vector[SampleMeta] = {
    val rnd = new scala.util.Random(seed)
    Vector.tabulate(n)(i => SampleMeta(i, s"s${i % 3}", 10 + rnd.nextInt(500), rnd.nextInt(300)))
  }

  def orch(items: Vector[SampleMeta]): Orchestration[SampleMeta] =
    Orchestration.samples(tree, items)

  test("distribute validates the axis eagerly") {
    intercept[RuntimeException](orch(metas(4)).distribute("BOGUS"))
  }

  test("plan covers every item exactly once") {
    val p = orch(metas(40)).distribute("DP").cost(CostFns.seqLen).balance("greedybinpack", 4).plan()
    assert(p.assignments.map(_.itemKey).sorted == (0L until 40L).toVector)
  }

  test("plan respects bucket and bin counts") {
    val p = orch(metas(40)).distribute("DP").balance("greedybinpack", 4).plan()
    assert(p.nBuckets == 4 && p.nBins == 4)
    assert(p.assignments.forall(a => a.bucket < 4 && a.bin < 4))
  }

  test("WORLD axis creates one bucket per rank") {
    val p = orch(metas(16)).distribute("WORLD").plan()
    assert(p.nBuckets == tree.world)
  }

  test("groupSize subgrouping still yields full bucket coverage") {
    val p = orch(metas(60)).distribute("DP", groupSize = 2)
      .cost(CostFns.seqLen).balance("greedybinpack", 2).plan()
    assert(p.nBuckets == 4)
    assert(p.assignments.map(_.itemKey).distinct.size == 60)
    assert((0 until 4).forall(b => p.assignments.exists(_.bucket == b)))
  }

  test("balanced plan has lower bucket imbalance than sequential") {
    val items = metas(200, seed = 9)
    val bal = orch(items).distribute("DP").cost(CostFns.seqLen).balance("greedybinpack", 4).plan()
    val seq = orch(items).distribute("DP").cost(CostFns.seqLen).balance("sequential", 4).plan()
    assert(bal.imbalance <= seq.imbalance)
  }

  test("broadcastAt(TP) halves the consumer set") {
    val base = orch(metas(8)).distribute("DP").plan()
    val thin = orch(metas(8)).distribute("DP").broadcastAt("TP").plan()
    assert(base.consumers.map(_.size).sum == tree.world)
    assert(thin.consumers.map(_.size).sum == tree.world / 2)
    assert(thin.consumers.flatten.forall(_.tp == 0))
  }

  test("intraBinReorder=false keeps arrival order inside buckets") {
    val items = metas(24)
    val p = orch(items).distribute("DP").cost(CostFns.seqLen)
      .balance("sequential", 3, intraBinReorder = false).plan()
    (0 until 4).foreach { b =>
      val inBucket = p.assignments.filter(_.bucket == b).sortBy(_.bin).map(_.itemKey)
      assert(inBucket == inBucket.sorted) // sequential deal preserves ids
    }
  }

  test("cost function values are recorded on assignments") {
    val p = orch(metas(10)).distribute("DP").cost(_.seqLen * 2.0).balance("greedybinpack", 2).plan()
    val byKey = metas(10).map(m => m.id -> m).toMap
    assert(p.assignments.forall(a => a.cost == byKey(a.itemKey).seqLen * 2.0))
  }

  test("bucketLoads and binLoads sum to the total cost") {
    val items = metas(30)
    val p = orch(items).distribute("DP").cost(CostFns.seqLen).balance("greedybinpack", 3).plan()
    val total = items.map(_.seqLen.toDouble).sum
    assert(math.abs(p.bucketLoads.sum - total) < 1e-6)
    assert(math.abs((0 until 4).map(b => p.binLoads(b).sum).sum - total) < 1e-6)
  }

  test("cells map every (bucket, bin) pair it mentions to its items") {
    val p = orch(metas(30)).distribute("DP").balance("sequential", 2).plan()
    assert(p.cells.values.map(_.size).sum == 30)
  }

  test("planInto transitions sampled items to Assigned in the DGraph") {
    val items = metas(12)
    val g = DGraph.fromBuffer(items)
    val (p, g2) = orch(items).distribute("DP").cost(CostFns.seqLen)
      .balance("greedybinpack", 2).planInto(g)
    items.foreach { m =>
      val st = g2.stateOf(m.id)
      val a  = p.assignments.find(_.itemKey == m.id).get
      assert(st == SampleState.Assigned(a.bucket, a.bin))
    }
  }

  test("packed-sequence orchestration expands to member sample ids") {
    val seqs = repro.data.Packing.firstFit(metas(20), 1024)
    val p = Orchestration.packed(tree, seqs).distribute("DP")
      .cost(CostFns.backbone(repro.costmodel.ModelConfigs.Llama12B))
      .balance("greedybinpack", 2).plan()
    assert(p.assignments.flatMap(_.sampleIds).sorted == (0L until 20L).toVector)
  }
}
