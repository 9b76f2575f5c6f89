package repro.loader

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.SampleMeta
import repro.data.{MultiSourceGen, SourceSpec}

/** A Source Loader (Sec. 3): dedicated to exactly one source, it owns that
  * source's file access state and applies sample transformations. In this
  * reproduction the loader is a Catalyst pipeline: one Parquet scan of its
  * own source directory plus per-sample transformation columns — so each
  * source's reader state exists exactly once in the job, which is the
  * architectural property the paper's disaggregation buys.
  */
final case class SourceLoader(spec: SourceSpec, dir: String) {

  /** Raw scan of this loader's single source. */
  def scan(spark: SparkSession): DataFrame = MultiSourceGen.readSource(spark, dir, spec)

  /** Sample transformation stage: tokenization/decoding surrogates that
    * derive trainable-representation metadata (sequence length, decoded
    * tensor bytes, estimated transform latency) from the raw columns.
    */
  def transformed(spark: SparkSession): DataFrame =
    scan(spark).select(
      col("id"), col("source"), col("text_len"), col("img_patches"), col("payload"),
      (col("text_len") + col("img_patches"))                  as "seq_len",
      (col("text_len") * 4 + col("img_patches") * 768)        as "decoded_bytes",
      (col("img_patches").cast("double") * spec.transformSec) as "transform_cost",
    )

  /** Buffer metadata the Planner plans over (Sec. 3 workflow step 4):
    * sample indices, source signature, and sequence lengths — never
    * payloads. `limit` bounds the read buffer.
    */
  def bufferMetadata(spark: SparkSession, limit: Int): Vector[SampleMeta] =
    scan(spark)
      .select("id", "source", "text_len", "img_patches")
      .orderBy("id")
      .limit(limit)
      .collect()
      .map(r => SampleMeta(r.getLong(0), r.getString(1), r.getLong(2), r.getLong(3)))
      .toVector
}
