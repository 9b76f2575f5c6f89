package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.E3Redundancy

/** E3 / paper Fig. 14 — simulated memory cost ratio over the (CP, PP)
  * grid: marginal constructor overhead at low parallelism, large savings
  * as model-parallel redundancy grows.
  */
class E3RedundancySuite extends AnyFunSuite {
  lazy val rows = E3Redundancy.sweep()

  test("Fig. 14 — memory cost ratio grid") {
    println(E3Redundancy.table(rows))
    assert(rows.size == 16)
  }

  test("shape: OVERLORD pays a buffering overhead at CP=PP=1") {
    val base = rows.find(r => r.cp == 1 && r.pp == 1).get.ratio
    assert(base > 1.0 && base < 3.0, s"base ratio $base")
  }

  test("shape: the ratio falls monotonically as CP x PP grows") {
    val byProd = rows.groupBy(r => r.cp * r.pp).view
      .mapValues(rs => rs.map(_.ratio).sum / rs.size).toSeq.sortBy(_._1)
    byProd.sliding(2).foreach { case Seq((_, a), (_, b)) => assert(b < a) }
  }

  test("shape: savings become substantial at high parallelism") {
    assert(rows.find(r => r.cp == 8 && r.pp == 8).get.ratio < 0.1)
  }

  test("CP and PP contribute symmetrically in this model") {
    val a = rows.find(r => r.cp == 4 && r.pp == 2).get.ratio
    val b = rows.find(r => r.cp == 2 && r.pp == 4).get.ratio
    assert(math.abs(a - b) / a < 0.05)
  }
}
