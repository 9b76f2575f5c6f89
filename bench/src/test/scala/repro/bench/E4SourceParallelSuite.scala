package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.E4SourceParallel

/** E4 / paper Fig. 15 — source parallelism (partitioning) vs loader host
  * memory with the trainer disabled.
  */
class E4SourceParallelSuite extends AnyFunSuite {
  lazy val rows = E4SourceParallel.sweep()

  test("Fig. 15 — loader memory vs workers, datasets and SP") {
    println(E4SourceParallel.table(rows))
    println(E4SourceParallel.summary(rows))
    assert(rows.size == 16)
  }

  test("shape: navit_100 needs significantly less memory than navit_data") {
    Seq(1, 2, 4, 8).foreach { w =>
      val small = rows.find(r => r.dataset == "navit_100" && r.workers == w && r.sp == 1).get
      val big   = rows.find(r => r.dataset == "navit_data" && r.workers == w && r.sp == 1).get
      assert(big.loaderMemGB > small.loaderMemGB * 1.5, s"workers=$w")
    }
  }

  test("shape: memory grows with worker count (worker scaling, Fig. 4)") {
    Seq("navit_100", "navit_data").foreach { ds =>
      val mems = Seq(1, 2, 4, 8).map(w =>
        rows.find(r => r.dataset == ds && r.workers == w && r.sp == 1).get.loaderMemGB)
      mems.sliding(2).foreach { case Seq(a, b) => assert(b > a) }
    }
  }

  test("shape: SP=2 yields a substantial memory reduction") {
    Seq("navit_100", "navit_data").foreach { ds =>
      val sp1 = rows.find(r => r.dataset == ds && r.workers == 4 && r.sp == 1).get.loaderMemGB
      val sp2 = rows.find(r => r.dataset == ds && r.workers == 4 && r.sp == 2).get.loaderMemGB
      assert(sp2 < sp1 * 0.7, s"$ds: SP=2 saved only ${1 - sp2 / sp1}")
    }
  }
}
