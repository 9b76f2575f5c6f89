package repro.loader

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SparkTestData}
import repro.core.{ClientPlaceTree, Planner}
import repro.costmodel.ModelConfigs

class DataConstructorSpec extends SparkSpec {
  val tree  = ClientPlaceTree(pp = 2, dp = 2, cp = 2, tp = 2)
  val ctx   = 8192L
  val nBins = 2

  lazy val loaders = {
    SparkTestData.ensure(spark)
    SparkTestData.group.sources.map(SourceLoader(_, SparkTestData.dir))
  }
  lazy val buffer = loaders.flatMap(_.bufferMetadata(spark, limit = 16)).toVector
  lazy val plan   = Planner.backboneBalance(buffer, tree, ctx, nBins, ModelConfigs.Llama12B)
  lazy val rows   = Planner.planRows(plan)
  lazy val outs   = loaders.map(_.transformed(spark))
  lazy val collated = DataConstructor.collate(spark, outs, rows, ctx).cache()

  test("collate materializes exactly the planned sequences") {
    val planned = plan.allSeqs.size
    assert(collated.count() == planned)
  }

  test("every planned sample reaches exactly one packed sequence") {
    assert(collated.agg(sum("n_segments")).collect()(0).getLong(0) == buffer.size)
  }

  test("per-sequence token sums match the planner's packed sequences") {
    val got = collated.select("bucket", "bin", "seqId", "tokens").collect()
      .map(r => (r.getInt(0), r.getInt(1), r.getLong(2)) -> r.getLong(3)).toMap
    for {
      (bucket, b) <- plan.backboneCells.zipWithIndex
      (bin, m)    <- bucket.zipWithIndex
      seq         <- bin
    } assert(got((b, m, seq.seqId)) == seq.tokens,
             s"tokens mismatch at ($b,$m,${seq.seqId})")
  }

  test("padding completes every sequence to the context length") {
    val bad = collated.filter(col("padding") =!= lit(ctx) - col("tokens"))
    assert(bad.count() == 0)
    assert(collated.filter(col("padding") < 0).count() == 0)
  }

  test("seg_lens arrays carry one entry per segment") {
    val bad = collated.filter(size(col("seg_lens")) =!= col("n_segments"))
    assert(bad.count() == 0)
  }

  test("oracle: per-bucket token totals agree with DuckDB over plan join data") {
    val data = outs.map(_.select("id", "seq_len")).reduce(_ unionByName _)
    val planDf = DataConstructor.planDf(spark, rows).select("sampleId", "bucket")
    val agg = collated.groupBy("bucket").agg(sum("tokens") as "toks")
    Oracle.assertEquivalent(
      agg.select(col("bucket").cast("long") as "bucket", col("toks")),
      s"SELECT CAST(p.bucket AS BIGINT) AS bucket, " +
        s"sum(LEAST(CAST(d.seq_len AS BIGINT), $ctx)) AS toks " +
        "FROM plan p JOIN data d ON CAST(p.sampleId AS BIGINT) = CAST(d.id AS BIGINT) " +
        "GROUP BY CAST(p.bucket AS BIGINT)",
      "plan" -> planDf, "data" -> data)
  }

  test("cpSlice fans every sequence out to cp contiguous chunks") {
    val sliced = DataConstructor.cpSlice(collated, ctx, cp = 2)
    assert(sliced.count() == collated.count() * 2)
    val sums = sliced.groupBy("bucket", "bin", "seqId").agg(sum("chunk_tokens") as "t")
      .join(collated.select(col("bucket") as "b2", col("bin") as "m2", col("seqId") as "s2", col("tokens")),
            col("bucket") === col("b2") && col("bin") === col("m2") && col("seqId") === col("s2"))
    assert(sums.filter(col("t") =!= col("tokens")).count() == 0)
  }

  test("cpSlice chunks never exceed ctx/cp real tokens") {
    val sliced = DataConstructor.cpSlice(collated, ctx, cp = 4)
    assert(sliced.filter(col("chunk_tokens") > ctx / 4).count() == 0)
  }

  test("cpSlice validates divisibility") {
    intercept[IllegalArgumentException](DataConstructor.cpSlice(collated, ctx, cp = 3))
  }

  test("deliver fans sequences out to each bucket's clients") {
    val d = DataConstructor.deliver(spark, collated, tree, broadcastDims = Set.empty)
    // Every sequence reaches all pp*cp*tp clients of its DP bucket.
    assert(d.count() == collated.count() * tree.pp * tree.cp * tree.tp)
  }

  test("deliver with broadcast_at(TP) halves the fetching clients") {
    val d = DataConstructor.deliver(spark, collated, tree, broadcastDims = Set("TP"))
    assert(d.count() == collated.count() * tree.pp * tree.cp)
    assert(d.filter(col("rank") % 2 =!= 0).count() == 0) // tp=1 ranks excluded
  }

  test("pipeline stages past the first receive metadata only") {
    val d = DataConstructor.deliver(spark, collated, tree, broadcastDims = Set.empty)
    assert(d.filter(col("metadata_only") && col("delivered_bytes") =!= 0).count() == 0)
    assert(d.filter(!col("metadata_only") && col("delivered_bytes") === 0).count() == 0)
  }

  test("delivered payload bytes shrink under metadata stripping") {
    val d = DataConstructor.deliver(spark, collated, tree, broadcastDims = Set.empty)
    val full = d.agg(sum("payload_bytes")).collect()(0).getLong(0)
    val sent = d.agg(sum("delivered_bytes")).collect()(0).getLong(0)
    assert(sent < full)
  }
}
