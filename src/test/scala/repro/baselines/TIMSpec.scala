package repro.baselines

import repro.SparkSpec
import repro.graph.{ExplicitModel, SocialGraph}
import repro.rrset.RRSource

class TIMSpec extends SparkSpec {

  test("logNChooseK matches exact binomials") {
    assert(math.abs(TIM.logNChooseK(5, 2) - math.log(10)) < 1e-9)
    assert(math.abs(TIM.logNChooseK(10, 0) - 0.0) < 1e-9)
    assert(math.abs(TIM.logNChooseK(10, 10) - 0.0) < 1e-9)
    assert(math.abs(TIM.logNChooseK(52, 5) - math.log(2598960.0)) < 1e-6)
  }

  test("logNChooseK clamps k above n") {
    assert(TIM.logNChooseK(5, 9) == TIM.logNChooseK(5, 5))
  }

  test("theta decreases as KPT grows") {
    val a = TIM.theta(1000, 10, kpt = 5.0, eps = 0.1, ell = 1.0)
    val b = TIM.theta(1000, 10, kpt = 50.0, eps = 0.1, ell = 1.0)
    assert(a > b)
  }

  test("theta grows as eps shrinks") {
    val a = TIM.theta(1000, 10, kpt = 10.0, eps = 0.3, ell = 1.0)
    val b = TIM.theta(1000, 10, kpt = 10.0, eps = 0.1, ell = 1.0)
    assert(b > a)
  }

  test("theta has a positive floor") {
    assert(TIM.theta(10, 1, kpt = 1e12, eps = 0.5, ell = 1.0) >= 256)
  }

  test("kptEstimate returns a positive lower bound on a simple graph") {
    val g = SocialGraph.fromPairs(6, Seq((0, 1), (0, 2), (1, 3), (2, 4), (3, 5)))
    val m = new ExplicitModel(g, Array(Array.fill(5)(0.8)))
    val src = new RRSource(spark, new SingleAdModel(m, 0), Array(1.0))
    val (kpt, sets) = TIM.kptEstimate(src, g, k = 2, ell = 1.0, seed = 1, subsim = false)
    assert(kpt > 0)
    assert(sets > 0)
  }

  test("kptEstimate scales with k") {
    val g = SocialGraph.fromPairs(6, Seq((0, 1), (1, 2), (3, 4), (4, 5)))
    val m = new ExplicitModel(g, Array(Array.fill(4)(0.9)))
    val src = new RRSource(spark, new SingleAdModel(m, 0), Array(1.0))
    val (k1, _) = TIM.kptEstimate(src, g, k = 1, ell = 1.0, seed = 2, subsim = false)
    val (k3, _) = TIM.kptEstimate(src, g, k = 3, ell = 1.0, seed = 2, subsim = false)
    assert(k3 >= k1 * 0.8) // larger seed sets can only help OPT_k
  }

  test("SingleAdModel projects one advertiser") {
    val g = SocialGraph.fromPairs(2, Seq((0, 1)))
    val m = new ExplicitModel(g, Array(Array(0.1), Array(0.9)))
    val s1 = new SingleAdModel(m, 1)
    assert(s1.h == 1 && s1.prob(0)(0) == 0.9)
  }
}
