package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SparkTestData}

class MultiSourceGenSpec extends SparkSpec {
  val spec  = SourceCatalog.coyo700m.sources.head
  val spec2 = SourceCatalog.coyo700m.sources(1)

  test("sourceDf yields the requested row count and schema") {
    val df = MultiSourceGen.sourceDf(spark, spec, 100)
    assert(df.count() == 100)
    assert(df.columns.toSet == Set("id", "source", "text_len", "img_patches"))
  }

  test("ids are namespaced per source and globally unique in a union") {
    val a = MultiSourceGen.sourceDf(spark, spec, 50)
    val b = MultiSourceGen.sourceDf(spark, spec2, 50)
    assert(a.unionByName(b).select("id").distinct().count() == 100)
  }

  test("generation is deterministic in (source, seed)") {
    val a = MultiSourceGen.sourceDf(spark, spec, 50).collect().toSeq
    val b = MultiSourceGen.sourceDf(spark, spec, 50).collect().toSeq
    assert(a == b)
  }

  test("different seeds change the draw") {
    val a = MultiSourceGen.sourceDf(spark, spec, 50, seed = 1).agg(sum("text_len")).collect()(0).getLong(0)
    val b = MultiSourceGen.sourceDf(spark, spec, 50, seed = 2).agg(sum("text_len")).collect()(0).getLong(0)
    assert(a != b)
  }

  test("text lengths respect the body/tail structure") {
    val rows = MultiSourceGen.sourceDf(spark, spec, 2000).select("text_len").collect().map(_.getLong(0))
    assert(rows.forall(l => l >= 4 && l <= MultiSourceGen.MaxLen))
    val bodyFrac = rows.count(_ <= spec.textBodyMax).toDouble / rows.length
    assert(bodyFrac > 0.95)
  }

  test("patch counts are positive and capped") {
    val rows = MultiSourceGen.sourceDf(spark, spec, 1000).select("img_patches").collect().map(_.getLong(0))
    assert(rows.forall(p => p >= 1 && p <= MultiSourceGen.MaxLen))
  }

  test("withPayload sizes filler to the raw-byte formula, capped") {
    val df = MultiSourceGen.withPayload(MultiSourceGen.sourceDf(spark, spec, 64), capBytes = 4096)
    val bad = df.filter(
      length(col("payload")) =!= least(lit(4096), (col("text_len") * 4 + col("img_patches") * 768).cast("int")))
    assert(bad.count() == 0)
  }

  test("writeGroupParquet persists one readable dataset per source") {
    SparkTestData.ensure(spark)
    SparkTestData.group.sources.foreach { s =>
      val df = MultiSourceGen.readSource(spark, SparkTestData.dir, s)
      assert(df.count() > 0)
      assert(df.select("source").distinct().collect().map(_.getString(0)).toSeq == Seq(s.name))
    }
  }

  test("oracle: per-source counts and token sums agree with DuckDB") {
    SparkTestData.ensure(spark)
    val all = SparkTestData.group.sources
      .map(MultiSourceGen.readSource(spark, SparkTestData.dir, _).select("id", "source", "text_len"))
      .reduce(_ unionByName _)
    val agg = all.groupBy("source")
      .agg(count(lit(1)) as "n", sum("text_len") as "toks")
    Oracle.assertEquivalent(agg,
      "SELECT source, count(*) AS n, sum(CAST(text_len AS BIGINT)) AS toks FROM samples GROUP BY source",
      "samples" -> all)
  }

  test("driver-side sampleMetas draw from the same distribution family") {
    val metas = MultiSourceGen.sampleMetas(spec, 2000)
    val sparkMean = MultiSourceGen.sourceDf(spark, spec, 2000)
      .agg(avg("text_len")).collect()(0).getDouble(0)
    val driverMean = metas.map(_.textLen).sum.toDouble / metas.size
    // Same family and parameters, different RNG streams: means agree loosely.
    assert(math.abs(sparkMean - driverMean) / sparkMean < 0.5)
  }

  test("groupMetas spans every source in the group") {
    val metas = MultiSourceGen.groupMetas(SourceCatalog.coyo700m, perSource = 3)
    assert(metas.size == 15)
    assert(metas.map(_.source).distinct.size == 5)
  }
}
