package repro.exp

import repro.sim.FetchSim
import repro.sim.FetchSim.{Config, Result}

/** E7 — scalability advantages of the actor model (paper Fig. 18,
  * Appendix B): data fetch latency at 1k/2k/4k GPUs for direct Source
  * Loader -> Trainer delivery versus routing through Data Constructors.
  * Paper shape: modest difference at 1k, ~10x higher baseline latency at
  * 2k, baseline collapse at 4k while OVERLORD sustains throughput.
  */
object E7Scalability {

  val loaders = 306
  /** One Data Constructor per 64 trainers (per-DP-group sinks). */
  def constructors(trainers: Int): Int = math.max(1, trainers / 64)

  final case class Row(gpus: Int, arch: String, latency: Double, collapsed: Boolean,
                       connections: Long)

  def run(scales: Seq[Int] = Seq(1024, 2048, 4096)): Seq[Row] =
    scales.flatMap { n =>
      val direct = FetchSim.fetchLatency(Config(n, loaders, constructors = 0))
      val ovld   = FetchSim.fetchLatency(Config(n, loaders, constructors = constructors(n)))
      Seq(toRow(n, "direct (no constructor)", direct),
          toRow(n, "overlord (constructor)", ovld))
    }

  private def toRow(n: Int, arch: String, r: Result): Row =
    Row(n, arch, r.latencySec, r.collapsed, r.totalConnections)

  def table(rows: Seq[Row]): String =
    Tables.render("E7 / Fig.18 — data fetch latency vs cluster scale",
      Seq("gpus", "architecture", "fetch latency s", "collapsed", "connections"),
      rows.map(r => Seq(r.gpus.toString, r.arch,
        if (r.collapsed) "inf" else Tables.f2(r.latency),
        if (r.collapsed) "yes" else "no", r.connections.toString)))

  def summary(rows: Seq[Row]): String = {
    def lat(g: Int, a: String) = rows.find(r => r.gpus == g && r.arch.startsWith(a)).get
    val r2k = lat(2048, "direct").latency / lat(2048, "overlord").latency
    val r1k = lat(1024, "direct").latency / lat(1024, "overlord").latency
    f"direct/overlord latency: 1k ${r1k}%.1fx (paper: modest), 2k ${r2k}%.1fx (paper: ~10x), " +
      s"4k direct collapsed=${lat(4096, "direct").collapsed} (paper: collapses), " +
      s"overlord collapsed=${lat(4096, "overlord").collapsed} (paper: sustains)"
  }
}
