package repro.core

/** One planned item placement: a schedulable item (sample, packed
  * sequence, or image) assigned to a bucket (distribution-axis slot) and
  * a microbatch bin within it.
  */
final case class ItemAssignment(itemKey: Long, sampleIds: Seq[Long], bucket: Int, bin: Int, cost: Double)

/** The Planner's output for one step (Sec. 4.2 `plan()`): where every
  * item goes and which trainer clients consume each bucket.
  *
  * @param step        training step the plan serves
  * @param axis        distribution axis ("DP" | "CP" | "WORLD")
  * @param nBuckets    bucket count at that axis
  * @param nBins       microbatch bins per bucket
  * @param assignments item placements
  * @param consumers   per bucket, the clients that fetch payloads (after
  *                    `broadcast_at` thinning); PP>0 clients fetch
  *                    metadata only
  */
final case class LoadingPlan(
    step: Int,
    axis: String,
    nBuckets: Int,
    nBins: Int,
    assignments: Vector[ItemAssignment],
    consumers: Vector[Vector[ClientRef]],
) {
  def bucketLoads: Vector[Double] =
    Vector.tabulate(nBuckets)(b => assignments.filter(_.bucket == b).map(_.cost).sum)

  def binLoads(bucket: Int): Vector[Double] =
    Vector.tabulate(nBins)(m => assignments.filter(a => a.bucket == bucket && a.bin == m).map(_.cost).sum)

  /** (bucket, bin) -> item keys, for constructors. */
  def cells: Map[(Int, Int), Vector[Long]] =
    assignments.groupBy(a => (a.bucket, a.bin)).view.mapValues(_.map(_.itemKey)).toMap

  def sampleBucket: Map[Long, Int] =
    assignments.flatMap(a => a.sampleIds.map(_ -> a.bucket)).toMap

  def imbalance: Double = {
    val loads = bucketLoads
    val mean  = loads.sum / math.max(1, loads.size)
    if (mean == 0) 1.0 else loads.max / mean
  }
}
