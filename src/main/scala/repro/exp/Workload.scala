package repro.exp

import repro.core.SampleMeta
import repro.data.{DatasetGroup, MultiSourceGen}
import scala.util.Random

/** Step-buffer construction for the driver-side experiments: draws a
  * mixed multisource buffer whose total token count covers one global
  * batch (dp x microbatches x context), the way Source Loader buffers
  * feed the Planner each step.
  */
object Workload {

  /** Samples per source cached per (group, seed); interleaved by a
    * seeded shuffle so arrival order mixes sources like a real stream.
    */
  def pool(group: DatasetGroup, perSource: Int, seed: Long): Vector[SampleMeta] = {
    val rnd = new Random(seed)
    rnd.shuffle(MultiSourceGen.groupMetas(group, perSource, seed))
  }

  /** Prefix of `pool` covering at least `targetTokens` backbone tokens. */
  def takeTokens(pool: Vector[SampleMeta], targetTokens: Long): Vector[SampleMeta] = {
    var acc = 0L
    val out = Vector.newBuilder[SampleMeta]
    val it  = pool.iterator
    while (acc < targetTokens && it.hasNext) {
      val s = it.next(); out += s; acc += s.seqLen
    }
    out.result()
  }

  /** One step's buffer: a fixed per-rank *sample* batch (the trainer sets
    * batch size in samples; token totals then vary with the draw, exactly
    * the Sec. 2.3 imbalance source). Distinct steps reseed the pool so
    * iterations see different data.
    */
  def stepBuffer(group: DatasetGroup, dp: Int, nBins: Int, ctx: Long,
                 step: Int, seed: Long = 11, samplesPerRank: Int = 32): Vector[SampleMeta] = {
    val n   = dp * samplesPerRank
    val per = math.max(8, n / group.sources.size + 8)
    pool(group, per, seed + step).take(n)
  }
}
