package repro.sim

/** Connection fan-out / egress contention model for the data delivery
  * tier, reproducing Appendix B (Fig. 18): direct Source Loader -> Trainer
  * transfer versus routing through Data Constructors.
  *
  * Each serving tier (loaders; optionally constructors) is modelled as a
  * server with per-step volume work (bytes / egress bandwidth) plus
  * per-connection overhead (setup, keepalive, head-of-line scheduling).
  * Queueing is approximated by the 1/(1 - rho) congestion factor against
  * the step budget; rho >= 1 means the tier cannot sustain the training
  * rate — the paper's "collapse".
  */
object FetchSim {

  final case class Config(
      trainers: Int,
      loaders: Int,
      /** 0 = direct delivery (no Data Constructor tier). */
      constructors: Int,
      bytesPerTrainerPerStep: Double = 50e6,
      egressBytesPerSec: Double = 2e9,
      perConnOverheadSec: Double = 5e-3,
      stepBudgetSec: Double = 20.0,
  ) {
    require(trainers > 0 && loaders > 0 && constructors >= 0)
  }

  final case class Result(latencySec: Double, collapsed: Boolean,
                          loaderFanout: Int, totalConnections: Long)

  private def tierLatency(volumeBytes: Double, fanout: Int, c: Config): Double = {
    val service = volumeBytes / c.egressBytesPerSec + fanout * c.perConnOverheadSec
    val rho     = service / c.stepBudgetSec
    if (rho >= 1.0) Double.PositiveInfinity else service / (1.0 - rho)
  }

  def fetchLatency(c: Config): Result = {
    val totalBytes = c.trainers * c.bytesPerTrainerPerStep
    if (c.constructors == 0) {
      // Direct: every trainer holds a connection to every loader.
      val lat = tierLatency(totalBytes / c.loaders, c.trainers, c)
      Result(lat, lat.isInfinity, c.trainers, c.trainers.toLong * c.loaders)
    } else {
      // Loaders serve constructors; constructors serve their trainer share.
      val lLat  = tierLatency(totalBytes / c.loaders, c.constructors, c)
      val fan   = math.ceil(c.trainers.toDouble / c.constructors).toInt
      val cLat  = tierLatency(totalBytes / c.constructors, fan, c)
      val lat   = lLat + cLat
      Result(lat, lat.isInfinity, c.constructors,
             c.constructors.toLong * c.loaders + c.trainers.toLong)
    }
  }
}
