package repro.data

import repro.core.SampleMeta

/** A packed training sequence: several subsequences (samples) merged into
  * one fixed-context sequence with a segmented attention mask
  * (Sec. 2.1 "Microbatch Transformation" — packing).
  *
  * @param seqId    id of the packed sequence within its batch
  * @param segments samples packed into this sequence, in pack order
  */
final case class PackedSeq(seqId: Long, segments: Vector[SampleMeta]) {
  def tokens: Long            = segments.map(_.seqLen).sum
  def segmentLens: Seq[Long]  = segments.map(_.seqLen)
  def imgPatches: Seq[Long]   = segments.map(_.imgPatches).filter(_ > 0)
  def padding(ctx: Long): Long = ctx - tokens
}

/** Sequence packing (the paper packs subsequences into complete sequences
  * before balancing; Sec. 2.1, Fig. 9 cost model inputs).
  */
object Packing {

  /** First-fit packing in arrival order: each sample goes into the first
    * open sequence with room, else opens a new one. Samples longer than
    * `ctx` are truncated to `ctx` (production truncates/chunks upstream;
    * this keeps every segment feasible).
    */
  def firstFit(samples: Seq[SampleMeta], ctx: Long): Vector[PackedSeq] = {
    require(ctx > 0, "context length must be positive")
    val open = scala.collection.mutable.ArrayBuffer.empty[(Long, scala.collection.mutable.ArrayBuffer[SampleMeta])]
    samples.foreach { s0 =>
      val s =
        if (s0.seqLen <= ctx) s0
        else {
          val text = math.min(s0.textLen, math.max(0L, ctx - s0.imgPatches))
          val img  = math.min(s0.imgPatches, ctx)
          s0.copy(textLen = math.min(text, ctx - math.min(img, ctx)), imgPatches = math.min(img, ctx))
        }
      open.find { case (used, _) => used + s.seqLen <= ctx } match {
        case Some(slot @ (used, buf)) =>
          buf += s
          open.update(open.indexOf(slot), (used + s.seqLen, buf))
        case None =>
          open += ((s.seqLen, scala.collection.mutable.ArrayBuffer(s)))
      }
    }
    open.zipWithIndex.map { case ((_, buf), i) => PackedSeq(i.toLong, buf.toVector) }.toVector
  }

  /** Packing efficiency: fraction of context slots holding real tokens. */
  def efficiency(seqs: Seq[PackedSeq], ctx: Long): Double =
    if (seqs.isEmpty) 1.0 else seqs.map(_.tokens).sum.toDouble / (seqs.size.toDouble * ctx)
}
