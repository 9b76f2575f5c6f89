package repro.autoscale

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{LinearCurriculum, StaticMix}

class MixtureScalerSpec extends AnyFunSuite {
  val sources  = (0 until 4).map(i => s"s$i")
  val baseline = sources.map(_ -> 2).toMap

  test("a static uniform mixture triggers no scaling") {
    val sc  = new MixtureScaler(baseline)
    val mix = StaticMix(sources.map(_ -> 0.25).toMap)
    (0 until 50).foreach(step => assert(sc.observe(mix, step).isEmpty))
    assert(sc.currentActors == baseline)
  }

  test("a curriculum ramp scales the growing source up after the patience window") {
    val sc = new MixtureScaler(baseline, patience = 3)
    val mix = LinearCurriculum(
      sources.map(_ -> 0.25).toMap,
      Map("s0" -> 0.7, "s1" -> 0.1, "s2" -> 0.1, "s3" -> 0.1), steps = 20)
    (0 to 40).foreach(sc.observe(mix, _))
    assert(sc.currentActors("s0") > baseline("s0"))
    assert(sc.events.exists(e => e.source == "s0" && e.toActors > e.fromActors))
  }

  test("declining demand reclaims actors back toward the baseline") {
    val sc = new MixtureScaler(baseline, patience = 2)
    val hot  = StaticMix(Map("s0" -> 0.9, "s1" -> 0.04, "s2" -> 0.03, "s3" -> 0.03))
    val cold = StaticMix(sources.map(_ -> 0.25).toMap)
    (0 until 20).foreach(sc.observe(hot, _))
    val peak = sc.currentActors("s0")
    assert(peak > baseline("s0"))
    (20 until 80).foreach(sc.observe(cold, _))
    assert(sc.currentActors("s0") < peak)
  }

  test("never scales below the baseline") {
    val sc = new MixtureScaler(baseline, patience = 2)
    val starved = StaticMix(Map("s0" -> 0.97, "s1" -> 0.01, "s2" -> 0.01, "s3" -> 0.01))
    (0 until 60).foreach(sc.observe(starved, _))
    assert(sources.forall(s => sc.currentActors(s) >= baseline(s)))
  }

  test("the maxActors bound is respected under extreme skew") {
    val sc = new MixtureScaler(baseline, patience = 1, maxActors = 5)
    val hot = StaticMix(Map("s0" -> 1.0, "s1" -> 0.0, "s2" -> 0.0, "s3" -> 0.0))
    (0 until 60).foreach(sc.observe(hot, _))
    assert(sc.currentActors("s0") <= 5)
  }

  test("scale events carry step, source and a reason") {
    val sc = new MixtureScaler(baseline, patience = 1)
    val hot = StaticMix(Map("s0" -> 0.9, "s1" -> 0.04, "s2" -> 0.03, "s3" -> 0.03))
    (0 until 30).foreach(sc.observe(hot, _))
    val e = sc.events.head
    assert(e.source == "s0" && e.reason.contains("ema") && e.toActors > e.fromActors)
  }

  test("reshard spreads partitions disjointly and completely") {
    val sc = new MixtureScaler(Map("s0" -> 3))
    val ranges = sc.reshard("s0", partitions = 10)
    assert(ranges.size == 3)
    assert(ranges.flatMap(_.toList).sorted == (0 until 10).toList)
    assert(ranges.map(_.size).max - ranges.map(_.size).min <= 1)
  }

  test("reshard after scale-up covers the same partition space with more actors") {
    val sc = new MixtureScaler(Map("s0" -> 1, "s1" -> 1), patience = 1)
    val hot = StaticMix(Map("s0" -> 0.95, "s1" -> 0.05))
    (0 until 20).foreach(sc.observe(hot, _))
    val n = sc.currentActors("s0")
    assert(n > 1)
    assert(sc.reshard("s0", 64).flatMap(_.toList).sorted == (0 until 64).toList)
  }

  test("weights are normalized internally (unnormalized schedules behave)") {
    val sc1 = new MixtureScaler(baseline, patience = 2)
    val sc2 = new MixtureScaler(baseline, patience = 2)
    val a = StaticMix(Map("s0" -> 9.0, "s1" -> 0.4, "s2" -> 0.3, "s3" -> 0.3))
    val b = StaticMix(Map("s0" -> 0.9, "s1" -> 0.04, "s2" -> 0.03, "s3" -> 0.03))
    (0 until 20).foreach { s => sc1.observe(a, s); sc2.observe(b, s) }
    assert(sc1.currentActors == sc2.currentActors)
  }

  test("an empty baseline is rejected") {
    intercept[IllegalArgumentException](new MixtureScaler(Map.empty))
  }
}
