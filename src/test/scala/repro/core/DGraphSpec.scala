package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DGraphSpec extends AnyFunSuite {
  def meta(id: Long, src: String = "s0", text: Long = 10, img: Long = 5): SampleMeta =
    SampleMeta(id, src, text, img)

  val buffer = Seq(meta(1), meta(2, "s1"), meta(3, "s1", img = 0))

  test("fromBuffer starts every sample Buffered") {
    val g = DGraph.fromBuffer(buffer)
    assert(g.size == 3)
    assert(buffer.forall(m => g.stateOf(m.id) == SampleState.Buffered))
  }

  test("duplicate ids are rejected") {
    intercept[IllegalArgumentException](DGraph.fromBuffer(Seq(meta(1), meta(1))))
  }

  test("transition appends lineage and an edge") {
    val g = DGraph.fromBuffer(buffer).transition(1, SampleState.Sampled, Some("mix"))
    assert(g.stateOf(1) == SampleState.Sampled)
    assert(g.lineage(1).size == 2)
    assert(g.edges.exists(e => e.from == ((1L, 0)) && e.to == ((1L, 1)) && e.label.contains("mix")))
  }

  test("transition of unknown sample fails") {
    intercept[RuntimeException](DGraph.fromBuffer(buffer).transition(99, SampleState.Sampled))
  }

  test("transitionAll moves a set of samples") {
    val g = DGraph.fromBuffer(buffer).transitionAll(Seq(1L, 2L), _ => SampleState.Sampled)
    assert(g.stateOf(1) == SampleState.Sampled && g.stateOf(2) == SampleState.Sampled)
    assert(g.stateOf(3) == SampleState.Buffered)
  }

  test("assigned and packed states carry placement info") {
    val g = DGraph.fromBuffer(buffer)
      .transition(1, SampleState.Assigned(2, 3))
      .transition(1, SampleState.Packed(7))
    assert(g.history(1) == Vector("buffered", "assigned(b2,mb3)", "packed(seq7)"))
  }

  test("link records a logical-dependency edge between samples") {
    val g = DGraph.fromBuffer(buffer).link(1, 2, "same-microbatch")
    assert(g.edges.exists(e => e.from._1 == 1 && e.to._1 == 2 && e.label.contains("same-microbatch")))
  }

  test("view selects a metadata-defined subgraph sharing the buffer") {
    val g = DGraph.fromBuffer(buffer).transition(2, SampleState.Sampled)
    val images = g.view(_.imgPatches > 0)
    assert(images.ids == Set(1L, 2L))
    assert(images.stateOf(2) == SampleState.Sampled) // lineage shared
  }

  test("bySource builds per-source graphs") {
    val g = DGraph.fromBuffer(buffer)
    assert(g.bySource("s1").ids == Set(2L, 3L))
    assert(g.bySource("s0").ids == Set(1L))
  }

  test("view drops edges crossing the cut") {
    val g = DGraph.fromBuffer(buffer).link(1, 3, "x")
    assert(g.view(_.id != 1).edges.forall(e => e.from._1 != 1 && e.to._1 != 1))
  }

  test("graphs are acyclic by construction") {
    val g = DGraph.fromBuffer(buffer)
      .transition(1, SampleState.Sampled)
      .transition(1, SampleState.Assigned(0, 0))
      .link(1, 2, "dep")
    assert(g.isAcyclic)
  }

  test("delivered state lists consumer ranks") {
    val g = DGraph.fromBuffer(buffer).transition(1, SampleState.Delivered(Seq(0, 4)))
    assert(g.history(1).last == "delivered(0,4)")
  }

  test("toDot emits one node per lineage entry and all edges") {
    val g = DGraph.fromBuffer(buffer).transition(1, SampleState.Sampled)
    val dot = g.toDot
    assert(dot.contains("\"1_0\"") && dot.contains("\"1_1\""))
    assert(dot.contains("->"))
    assert(dot.startsWith("digraph"))
  }
}
