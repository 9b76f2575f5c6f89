package repro.exp

/** E6 — ablation on read-amplification / memory-cost parameters (paper
  * Fig. 17, Appendix A): starting from the Fig. 14 base configuration
  * (BS=512, workers=4, 512 nodes), vary batch size to 2048, workers to
  * 16, and cluster size to 4096 nodes, reporting the OVERLORD/colocated
  * memory cost ratio at low and high model-parallel granularity.
  *
  * Expected shape: bigger batches raise OVERLORD's ratio (constructor
  * buffering scales with data size); more workers deepen colocated
  * redundancy so the ratio falls; bigger clusters at low CP/PP raise the
  * ratio, while high CP/PP keeps OVERLORD cost-efficient.
  */
object E6Ablation {

  import E3Redundancy.{ratio, sizing}

  final case class Row(param: String, value: String, cpPp: String, ratio: Double)

  def sweep(): Seq[Row] = {
    val lows  = (1, 1)
    val highs = (4, 4)
    def both(param: String, value: String, f: (Int, Int) => Double): Seq[Row] =
      Seq(Row(param, value, "cp1/pp1", f(lows._1, lows._2)),
          Row(param, value, "cp4/pp4", f(highs._1, highs._2)))

    Seq(512, 1024, 2048).flatMap { bs =>
      both("batch", bs.toString, (cp, pp) => ratio(cp, pp, perDp = bs.toDouble))
    } ++
      Seq(4, 8, 16).flatMap { w =>
        both("workers", w.toString, (cp, pp) => ratio(cp, pp, s = sizing.copy(workers = w)))
      } ++
      Seq(512, 1024, 2048, 4096).flatMap { n =>
        both("nodes", n.toString, (cp, pp) => ratio(cp, pp, nodes = n))
      }
  }

  def table(rows: Seq[Row]): String =
    Tables.render("E6 / Fig.17 — ablation on memory cost ratio (base: BS=512, W=4, 512 nodes)",
      Seq("param", "value", "parallelism", "ratio"),
      rows.map(r => Seq(r.param, r.value, r.cpPp, Tables.f3(r.ratio))))
}
