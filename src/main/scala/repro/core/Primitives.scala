package repro.core

/** The declarative orchestration builder behind the Fig. 9 programming
  * model. A strategy is written as a chain
  *
  * {{{
  * Orchestration(tree, items)(key, sampleIds)
  *   .distribute("DP")
  *   .cost(fn)
  *   .broadcastAt("TP")
  *   .balance("greedybinpack", nBins = m)
  *   .plan(step)
  * }}}
  *
  * `T` is whatever the strategy schedules — `SampleMeta`, `PackedSeq`, or
  * `ImageItem` — mirroring the paper's per-modality DGraphs built from the
  * same shared buffer.
  */
final case class Orchestration[T](
    tree: ClientPlaceTree,
    items: Vector[T],
    key: T => Long,
    sampleIds: T => Seq[Long],
    axis: String = "DP",
    groupSize: Int = 1,
    costFn: T => Double = (_: T) => 1.0,
    method: String = "sequential",
    nBins: Int = 1,
    intraBinReorder: Boolean = true,
    broadcastDims: Set[String] = Set.empty,
) {

  /** distribute(axis, group_size): pick the ClientPlaceTree level that
    * defines the buckets; `groupSize > 1` balances within subgroups of
    * that level to cut coordination cost on very large clusters.
    */
  def distribute(axis: String, groupSize: Int = 1): Orchestration[T] = {
    require(groupSize >= 1)
    tree.bucketCount(axis) // validates the axis eagerly
    copy(axis = axis, groupSize = groupSize)
  }

  /** cost(costfn): register the per-item cost estimate. */
  def cost(fn: T => Double): Orchestration[T] = copy(costFn = fn)

  /** balance(method, *): choose the balancing method and microbatch bin
    * count; `intraBinReorder = false` keeps arrival order inside each
    * bucket (the paper's option to keep the global batch unchanged).
    */
  def balance(method: String, nBins: Int = 1, intraBinReorder: Boolean = true): Orchestration[T] = {
    require(nBins >= 1)
    copy(method = method, nBins = nBins, intraBinReorder = intraBinReorder)
  }

  /** broadcast_at(dim): the trainer broadcasts along `dim`, so only
    * dim-0 clients fetch payloads from the constructor.
    */
  def broadcastAt(dim: String): Orchestration[T] = copy(broadcastDims = broadcastDims + dim)

  /** plan(): run the balancing hierarchy and emit the loading plan.
    *
    * Bucket level: with `groupSize` g, items are first balanced over
    * ceil(n/g) superbuckets, then balanced again within each superbucket
    * over its member buckets. Bin level: items of each bucket are split
    * into `nBins` microbatch bins (inter-microbatch balancing), with the
    * same method, or dealt in order when `intraBinReorder` is off.
    */
  def plan(step: Int = 0): LoadingPlan = {
    val n      = tree.bucketCount(axis)
    val nSuper = math.ceil(n.toDouble / groupSize).toInt
    val superBuckets = Balancer.byName(method, items, nSuper, costFn)
    val buckets = Vector.newBuilder[Vector[T]]
    superBuckets.zipWithIndex.foreach { case (group, si) =>
      val members = math.min(groupSize, n - si * groupSize)
      Balancer.byName(method, group, members, costFn).foreach(buckets += _)
    }
    val perBucket = buckets.result()
    require(perBucket.size == n, s"bucket construction bug: ${perBucket.size} != $n")

    val assignments = perBucket.zipWithIndex.flatMap { case (bucketItems, b) =>
      val bins =
        if (intraBinReorder) Balancer.byName(method, bucketItems, nBins, costFn)
        else Balancer.sequential(bucketItems, nBins)
      bins.zipWithIndex.flatMap { case (binItems, m) =>
        binItems.map(t => ItemAssignment(key(t), sampleIds(t), b, m, costFn(t)))
      }
    }
    val consumers = tree.bucketClients(axis).map(cs => tree.broadcastFilter(cs, broadcastDims))
    LoadingPlan(step, axis, n, nBins, assignments, consumers)
  }

  /** Records the plan into a DGraph: sampled items transition to
    * Assigned(bucket, bin), giving the lineage view of Sec. 4.1.
    */
  def planInto(g: DGraph, step: Int = 0): (LoadingPlan, DGraph) = {
    val p = plan(step)
    val assignedState: Map[Long, SampleState] = p.assignments.flatMap { a =>
      a.sampleIds.map(_ -> SampleState.Assigned(a.bucket, a.bin))
    }.toMap
    val g2 = assignedState.foldLeft(g) { case (acc, (id, st)) =>
      if (acc.ids.contains(id)) acc.transition(id, st, Some(s"balance:$method")) else acc
    }
    (p, g2)
  }
}

object Orchestration {
  /** Entry point over raw sample metadata. */
  def samples(tree: ClientPlaceTree, items: Seq[SampleMeta]): Orchestration[SampleMeta] =
    Orchestration[SampleMeta](tree, items.toVector, _.id, m => Seq(m.id))

  /** Entry point over packed sequences (backbone scheduling). */
  def packed(tree: ClientPlaceTree, items: Seq[repro.data.PackedSeq]): Orchestration[repro.data.PackedSeq] =
    Orchestration[repro.data.PackedSeq](tree, items.toVector, _.seqId, _.segments.map(_.id))

  /** Entry point over image items (encoder scheduling). */
  def images(tree: ClientPlaceTree, items: Seq[ImageItem]): Orchestration[ImageItem] =
    Orchestration[ImageItem](tree, items.toVector, _.sampleId, i => Seq(i.sampleId))
}
