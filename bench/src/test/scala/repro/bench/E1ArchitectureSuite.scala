package repro.bench

import repro.{SparkSpec, SparkTestData}
import repro.core.{ClientPlaceTree, Planner}
import repro.costmodel.ModelConfigs
import repro.data.SourceCatalog
import repro.exp.{E1Architecture, Tables}
import repro.loader.{ColocatedBaseline, SourceLoader}

/** E1 / paper Fig. 12 — preprocessing architecture comparison. Prints the
  * memory-per-node and fetch-overhead table from the calibrated memory
  * model, plus a *measured* Spark read-amplification microbenchmark of the
  * same colocated-vs-disaggregated data path at local scale, and asserts
  * the paper's shape claims.
  */
class E1ArchitectureSuite extends SparkSpec {

  test("Fig. 12 — memory per node and fetch overhead across architectures") {
    val rows = E1Architecture.run()
    println(E1Architecture.table(rows))
    println(E1Architecture.summary(rows))

    def at(scale: Int, arch: String) = rows.find(r => r.scale == scale && r.arch == arch).get
    // Shape: order-of-magnitude memory reduction at both scales (paper: up to 13.5x).
    Seq(288, 576).foreach { s =>
      val red = at(s, "colocated").memGB / at(s, "overlord-auto").memGB
      assert(red > 8 && red < 25, s"memory reduction $red out of the paper's band at $s GPUs")
    }
    // Shape: vanilla cannot feed the 576-GPU job; auto feeds both.
    assert(!at(288, "overlord-vanilla").stalled)
    assert(at(576, "overlord-vanilla").stalled)
    assert(!at(288, "overlord-auto").stalled && !at(576, "overlord-auto").stalled)
    // Shape: colocated shows fetch fluctuation only at the larger scale.
    assert(at(576, "colocated").fetchMax > at(288, "colocated").fetchMax)
  }

  test("Fig. 12 (measured) — Spark read amplification, colocated vs disaggregated") {
    // SF~0.1: a few thousand rows per source, real Parquet scans.
    SparkTestData.ensure(spark)
    val group   = SourceCatalog.coyo700m
    val loaders = group.sources.map(SourceLoader(_, SparkTestData.dir))
    val nRanks  = 8
    val buffer  = loaders.flatMap(_.bufferMetadata(spark, limit = 64)).toVector
    val tree    = ClientPlaceTree(pp = 1, dp = nRanks, cp = 1, tp = 1)
    val rows    = Planner.planRows(Planner.backboneBalance(buffer, tree, 32768, 4, ModelConfigs.Llama12B))

    val coloc  = ColocatedBaseline.fetch(spark, group, SparkTestData.dir, nRanks)
    val disagg = ColocatedBaseline.fetchDisaggregated(spark, loaders.map(_.transformed(spark)), rows, 32768)

    println(Tables.render("E1 (measured) — Spark data path, 8 DP ranks",
      Seq("architecture", "rows scanned", "rows delivered", "wall ms"),
      Seq(Seq("colocated (scan-all-per-rank)", coloc.rowsScanned.toString,
              coloc.rowsDelivered.toString, coloc.wallMs.toString),
          Seq("disaggregated (scan-once+shuffle)", disagg.rowsScanned.toString,
              disagg.rowsDelivered.toString, disagg.wallMs.toString))))

    assert(coloc.rowsScanned == disagg.rowsScanned * nRanks,
      "colocated must scan every source once per rank")
  }
}
