package repro.loader

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{ClientPlaceTree, PlanRow}

/** The Data Constructor (Sec. 3): aggregates Source Loader outputs per DP
  * bucket and applies the microbatch transformations (packing/padding) and
  * parallelism transformations (CP sequence slicing, PP metadata
  * stripping, broadcast thinning).
  *
  * Dataflow: plan rows join the unioned loader outputs on sample id, the
  * result is shuffled by (bucket, bin, seqId) — one shuffle, replacing the
  * N-rank redundant reads of the colocated design — and collated into
  * packed sequences.
  */
object DataConstructor {

  /** The loading plan as a small DataFrame the join can consume. */
  def planDf(spark: SparkSession, rows: Seq[PlanRow]): DataFrame = {
    import spark.implicits._
    rows.toDF("sampleId", "source", "bucket", "bin", "seqId")
  }

  /** Packed, padded per-(bucket, microbatch) sequences.
    *
    * Output columns: bucket, bin, seqId, n_segments, seg_lens (pack-order
    * segment lengths), tokens, padding, payload_bytes.
    */
  def collate(spark: SparkSession, loaderOutputs: Seq[DataFrame], rows: Seq[PlanRow],
              ctx: Long): DataFrame = {
    // Oversize samples are truncated to the context (exactly as the
    // Planner's packing does), so a capped sample fills one sequence.
    val data = loaderOutputs
      .map(_.select(col("id"), least(col("seq_len"), lit(ctx)) as "seq_len",
                    length(col("payload")) as "pbytes"))
      .reduce(_ unionByName _)
    val joined = planDf(spark, rows).join(data, col("sampleId") === col("id"), "inner")
    joined
      .repartition(col("bucket"))
      .groupBy("bucket", "bin", "seqId")
      .agg(
        count(lit(1))                                   as "n_segments",
        // Pack order == sample-id order in this reproduction, so the
        // sorted struct array recovers the segment sequence.
        expr("transform(sort_array(collect_list(struct(sampleId, seq_len))), x -> x.seq_len)")
                                                        as "seg_lens",
        sum("seq_len")                                  as "tokens",
        sum("pbytes")                                   as "payload_bytes",
      )
      .withColumn("padding", lit(ctx) - col("tokens"))
  }

  /** CP parallelism transformation: each packed sequence is sliced into
    * `cp` contiguous context chunks; CP rank r consumes chunk r. Token
    * counts per chunk follow the padded context (ctx/cp each), with real
    * (non-pad) tokens attributed to the chunks they fall in.
    */
  def cpSlice(collated: DataFrame, ctx: Long, cp: Int): DataFrame = {
    require(cp >= 1 && ctx % cp == 0, s"ctx=$ctx must divide cp=$cp")
    val chunk = ctx / cp
    collated
      .withColumn("cp_rank", explode(sequence(lit(0), lit(cp - 1))))
      .withColumn("chunk_start", col("cp_rank") * chunk)
      .withColumn(
        "chunk_tokens",
        greatest(lit(0L), least(lit(chunk), col("tokens") - col("chunk_start"))))
      .drop("chunk_start")
  }

  /** Delivery view: one row per (sequence row x consuming client), after
    * `broadcast_at` thinning; PP>0 clients are marked metadata-only and
    * carry no payload bytes (Sec. 3 design rationale).
    */
  def deliver(spark: SparkSession, collated: DataFrame, tree: ClientPlaceTree,
              broadcastDims: Set[String]): DataFrame = {
    import spark.implicits._
    val clients = tree.bucketClients("DP").zipWithIndex.flatMap { case (cs, b) =>
      tree.broadcastFilter(cs, broadcastDims).map(c => (b, c.rank, c.pp, tree.metadataOnly(c)))
    }.toDF("c_bucket", "rank", "pp", "metadata_only")
    collated
      .join(clients, col("bucket") === col("c_bucket"))
      .drop("c_bucket")
      .withColumn("delivered_bytes",
                  when(col("metadata_only"), lit(0L)).otherwise(col("payload_bytes")))
  }
}
