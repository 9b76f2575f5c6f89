package repro.core

/** Processing states a sample moves through in the data plane (Sec. 4.1).
  * Each state change appends a node to the sample's lineage in `DGraph`.
  */
sealed trait SampleState { def label: String }
object SampleState {
  /** In a Source Loader read buffer, bound to its producing source. */
  case object Buffered extends SampleState { val label = "buffered" }
  /** Selected by `mix` for the current step. */
  case object Sampled extends SampleState { val label = "sampled" }
  /** Placed by `balance`/`plan` into (bucket, microbatch bin). */
  final case class Assigned(bucket: Int, bin: Int) extends SampleState {
    val label = s"assigned(b$bucket,mb$bin)"
  }
  /** Packed into sequence `seqId` by the microbatch transformation. */
  final case class Packed(seqId: Long) extends SampleState { val label = s"packed(seq$seqId)" }
  /** Shipped by a Data Constructor to concrete trainer clients. */
  final case class Delivered(ranks: Seq[Int]) extends SampleState {
    val label = s"delivered(${ranks.mkString(",")})"
  }
}

/** A node: one sample observed in one state (version = lineage depth). */
final case class DNode(sampleId: Long, version: Int, state: SampleState)

/** A directed edge between states: a data transformation or a logical
  * dependency (e.g. microbatch grouping). `label == None` models the
  * paper's "null" edges where no state mutation occurs.
  */
final case class DEdge(from: (Long, Int), to: (Long, Int), label: Option[String])

/** Stateful dataflow graph tracking dependency and lineage per sample
  * (Sec. 4.1). Operates purely on metadata. Immutable: every transition
  * returns a new graph, so a plan's full history stays inspectable.
  */
final class DGraph private (
    val samples: Map[Long, SampleMeta],
    val lineage: Map[Long, Vector[DNode]],
    val edges: Vector[DEdge],
) {
  def size: Int = samples.size
  def ids: Set[Long] = samples.keySet

  def stateOf(id: Long): SampleState = lineage(id).last.state

  /** Appends a state to `id`'s lineage with a transformation edge. */
  def transition(id: Long, next: SampleState, label: Option[String] = None): DGraph = {
    val hist = lineage.getOrElse(id, sys.error(s"unknown sample $id"))
    val node = DNode(id, hist.size, next)
    new DGraph(samples, lineage.updated(id, hist :+ node),
               edges :+ DEdge((id, hist.size - 1), (id, hist.size), label))
  }

  def transitionAll(idsToMove: Iterable[Long], next: Long => SampleState,
                    label: Option[String] = None): DGraph =
    idsToMove.foldLeft(this)((g, id) => g.transition(id, next(id), label))

  /** Adds a logical-dependency edge between two samples' latest states
    * (e.g. "packed into the same sequence").
    */
  def link(a: Long, b: Long, label: String): DGraph =
    new DGraph(samples, lineage,
               edges :+ DEdge((a, lineage(a).size - 1), (b, lineage(b).size - 1), Some(label)))

  /** Selective-metadata view (Sec. 4.1 "unified multisource
    * representation"): a sub-graph over samples matching `pred`, sharing
    * the same underlying metadata. Used to build per-modality or
    * per-source graphs from one shared buffer.
    */
  def view(pred: SampleMeta => Boolean): DGraph = {
    val keep = samples.filter { case (_, m) => pred(m) }
    new DGraph(keep, lineage.view.filterKeys(keep.keySet).toMap,
               edges.filter(e => keep.contains(e.from._1) && keep.contains(e.to._1)))
  }

  def bySource(source: String): DGraph = view(_.source == source)

  /** True iff every edge goes forward in version order — the graph is a
    * DAG by construction; this validates invariant preservation.
    */
  def isAcyclic: Boolean = edges.forall(e => e.from._1 != e.to._1 || e.from._2 < e.to._2)

  /** Lineage of one sample as labelled state names, for transparency. */
  def history(id: Long): Vector[String] = lineage(id).map(_.state.label)

  /** Graphviz DOT export — the paper's "orchestration transparency". */
  def toDot: String = {
    val sb = new StringBuilder("digraph dgraph {\n")
    for ((id, hist) <- lineage.toSeq.sortBy(_._1); n <- hist)
      sb.append(s"""  "${id}_${n.version}" [label="$id:${n.state.label}"];\n""")
    for (e <- edges)
      sb.append(s"""  "${e.from._1}_${e.from._2}" -> "${e.to._1}_${e.to._2}"""" +
        e.label.map(l => s""" [label="$l"]""").getOrElse("") + ";\n")
    sb.append("}\n").result()
  }
}

object DGraph {
  /** Initializes the graph from Source Loader buffer metadata: every
    * sample starts `Buffered`, bound to its source.
    */
  def fromBuffer(buffer: Seq[SampleMeta]): DGraph = {
    val byId = buffer.map(m => m.id -> m).toMap
    require(byId.size == buffer.size, "duplicate sample ids in buffer")
    new DGraph(byId,
               byId.map { case (id, _) => id -> Vector(DNode(id, 0, SampleState.Buffered)) },
               Vector.empty)
  }
}
