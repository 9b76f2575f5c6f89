package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.costmodel.ModelConfigs
import repro.exp.Tables

/** T1 — paper Table 1: the model zoo driving every other table. */
class T1ModelConfigSuite extends AnyFunSuite {
  test("Table 1 — model configurations") {
    val rows = ModelConfigs.all.map(m =>
      Seq(m.name, m.layers.toString, m.heads.toString, m.hidden.toString,
          if (m.isMoE) s"top${m.topK}/${m.numExperts}" else "dense"))
    println(Tables.render("T1 — model configurations (paper Table 1)",
      Seq("model", "layers", "heads", "hidden", "type"), rows))
    assert(ModelConfigs.all.map(_.name) ==
      Seq("ViT-1B", "ViT-2B", "Llama-12B", "tMoE-25B", "Mixtral-8x7B"))
  }
}
