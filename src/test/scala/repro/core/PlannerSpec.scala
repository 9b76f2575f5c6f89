package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.costmodel.ModelConfigs
import repro.data.SourceCatalog
import repro.exp.Workload

class PlannerSpec extends AnyFunSuite {
  val tree  = ClientPlaceTree(pp = 1, dp = 4, cp = 1, tp = 2)
  val ctx   = 8192L
  val nBins = 4
  val bb    = ModelConfigs.Llama12B
  val enc   = ModelConfigs.ViT1B

  def buffer(seed: Int = 0): Vector[SampleMeta] =
    Workload.stepBuffer(SourceCatalog.coyo700m, tree.dp, nBins, ctx, seed)

  def allSampleIds(p: StepPlan): Vector[Long] =
    p.backboneCells.flatten.flatten.flatMap(_.segments.map(_.id)).sorted

  test("vanilla plan preserves every sample exactly once") {
    val buf = buffer()
    val p   = Planner.vanilla(buf, tree, ctx, nBins)
    assert(allSampleIds(p) == buf.map(_.id).sorted)
  }

  test("vanilla shards samples near-equally by count across DP ranks") {
    val buf = buffer()
    val p   = Planner.vanilla(buf, tree, ctx, nBins)
    val counts = p.backboneCells.map(_.flatten.flatMap(_.segments).size)
    assert(counts.max - counts.min <= buf.size / tree.dp / 2 + 1)
  }

  test("backbone balance preserves every sample exactly once") {
    val buf = buffer()
    val p   = Planner.backboneBalance(buf, tree, ctx, nBins, bb)
    assert(allSampleIds(p) == buf.map(_.id).sorted)
  }

  test("hybrid balance preserves backbone cells and rebalances images") {
    val buf = buffer()
    val b   = Planner.backboneBalance(buf, tree, ctx, nBins, bb)
    val h   = Planner.hybridBalance(buf, tree, ctx, nBins, bb, enc)
    assert(h.backboneCells == b.backboneCells)
    assert(h.allImages.map(_.sampleId).sorted == b.allImages.map(_.sampleId).sorted)
  }

  test("no packed sequence exceeds the context length") {
    val p = Planner.byName("hybrid", buffer(), tree, ctx, nBins, bb, enc)
    assert(p.allSeqs.forall(_.tokens <= ctx))
  }

  test("every image stays in the same microbatch bin as its sequence") {
    val p = Planner.hybridBalance(buffer(), tree, ctx, nBins, bb, enc)
    val seqBin = (for {
      (bucket, _) <- p.backboneCells.zipWithIndex
      (bin, m)    <- bucket.zipWithIndex
      seq         <- bin; s <- seq.segments if s.imgPatches > 0
    } yield s.id -> m).toMap
    for (r <- 0 until tree.world; m <- 0 until nBins; img <- p.encoderCells(r)(m))
      assert(seqBin(img.sampleId) == m, s"image ${img.sampleId} strayed from its bin")
  }

  test("backbone balance lowers per-bucket cost imbalance vs vanilla") {
    val buf  = buffer()
    val cost = CostFns.backbone(bb)
    def bucketImb(p: StepPlan): Double = {
      val loads = p.backboneCells.map(_.flatten.map(cost).sum)
      loads.max / (loads.sum / loads.size)
    }
    assert(bucketImb(Planner.backboneBalance(buf, tree, ctx, nBins, bb)) <=
           bucketImb(Planner.vanilla(buf, tree, ctx, nBins)))
  }

  test("hybrid balance lowers encoder imbalance vs backbone-only") {
    val buf  = buffer()
    val cost = CostFns.encoder(enc)
    def encImb(p: StepPlan): Double = {
      val loads = (0 until tree.world).map(r => p.encoderCells(r).flatten.map(cost).sum)
      val mean  = loads.sum / loads.size
      if (mean == 0) 1.0 else loads.max / mean
    }
    val hb = encImb(Planner.hybridBalance(buf, tree, ctx, nBins, bb, enc))
    val bo = encImb(Planner.backboneBalance(buf, tree, ctx, nBins, bb))
    assert(hb <= bo)
  }

  test("vanilla images are served by their own bucket's GPU ranks") {
    val p = Planner.vanilla(buffer(), tree, ctx, nBins)
    val sampleBucket = (for {
      (bucket, b) <- p.backboneCells.zipWithIndex
      seq <- bucket.flatten; s <- seq.segments
    } yield s.id -> b).toMap
    for (r <- 0 until tree.world; m <- 0 until nBins; img <- p.encoderCells(r)(m))
      assert(tree.client(r).dp == sampleBucket(img.sampleId))
  }

  test("seqIds are unique within a plan") {
    Seq("vanilla", "backbone", "hybrid").foreach { s =>
      val p = Planner.byName(s, buffer(), tree, ctx, nBins, bb, enc)
      val ids = p.allSeqs.map(_.seqId)
      assert(ids.distinct.size == ids.size, s"duplicate seqIds under $s")
    }
  }

  test("planRows flattens the plan losslessly") {
    val buf  = buffer()
    val p    = Planner.backboneBalance(buf, tree, ctx, nBins, bb)
    val rows = Planner.planRows(p)
    assert(rows.map(_.sampleId).sorted == buf.map(_.id).sorted)
    assert(rows.forall(r => r.bucket < tree.dp && r.bin < nBins))
    val bySeq = rows.groupBy(r => (r.bucket, r.bin, r.seqId))
    assert(bySeq.values.forall(_.map(_.sampleId).distinct.size > 0))
  }

  test("byName rejects unknown strategies") {
    intercept[RuntimeException](Planner.byName("magic", buffer(), tree, ctx, nBins, bb, enc))
  }

  test("imagesOf extracts only image-bearing samples") {
    val seqs = repro.data.Packing.firstFit(
      Vector(SampleMeta(1, "a", 10, 0), SampleMeta(2, "a", 10, 7)), 1024)
    val imgs = Planner.imagesOf(seqs)
    assert(imgs.map(_.sampleId) == Vector(2L) && imgs.head.patches == 7)
  }

  test("totalTokens matches the sum over packed sequences") {
    val p = Planner.vanilla(buffer(), tree, ctx, nBins)
    assert(p.totalTokens == p.allSeqs.map(_.tokens).sum)
  }
}
