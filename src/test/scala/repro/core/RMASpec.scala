package repro.core

import repro.SparkSpec
import repro.graph.{ExplicitModel, SocialGraph}
import repro.rrset.RRCollection

class RMASpec extends SparkSpec {

  // A small probabilistic instance with a brute-forcible exact optimum:
  // 8 nodes, h=2, ≤8 random edges per ad.
  private lazy val g = SocialGraph.fromPairs(8,
    Seq((0, 1), (0, 2), (1, 3), (2, 3), (4, 5), (5, 6), (6, 7), (4, 7)))
  private lazy val probs = Array(
    Array(0.6, 0.6, 0.5, 0.5, 0.4, 0.4, 0.4, 0.4),
    Array(0.3, 0.3, 0.7, 0.7, 0.6, 0.6, 0.2, 0.2))
  private lazy val model = new ExplicitModel(g, probs)
  private lazy val cpe = Array(1.0, 1.5)
  private lazy val exact = new ExactOracle(model, cpe)
  private lazy val costs = Array(
    Array(0.6, 0.4, 0.4, 0.3, 0.6, 0.4, 0.4, 0.3),
    Array(0.5, 0.5, 0.5, 0.4, 0.7, 0.5, 0.4, 0.4))
  private lazy val budgets = Array(4.0, 5.0)
  private lazy val cfg = RMA.Config(eps = 0.05, delta = 0.1, tau = 0.1, rho = 0.2, seed = 5L)

  test("muOf packs cheapest nodes within the relaxed budget") {
    assert(RMA.muOf(Array(1.0, 2.0, 3.0), cpe = 1.0, relaxedBudget = 5.5) == 2)
    assert(RMA.muOf(Array(10.0), cpe = 1.0, relaxedBudget = 5.0) == 1) // clamped ≥ 1
    assert(RMA.muOf(Array(0.1, 0.1, 0.1), cpe = 0.0, relaxedBudget = 10.0) == 3)
  }

  test("thetaMax is positive and grows as eps shrinks") {
    val mus = Array(3, 4)
    // large bMin so θ̂ (the ε-dependent term) dominates the max
    val t1 = RMA.thetaMax(100, 2.0, 0.1, 0.1, 0.01, 0.1, 1e6, mus)
    val t2 = RMA.thetaMax(100, 2.0, 0.1, 0.05, 0.01, 0.1, 1e6, mus)
    assert(t1 > 0 && t2 > t1)
    // and the ε-independent θ̄ term makes it insensitive when it dominates
    val t3 = RMA.thetaMax(100, 2.0, 0.1, 0.1, 0.01, 0.1, 1e-3, mus)
    val t4 = RMA.thetaMax(100, 2.0, 0.1, 0.05, 0.01, 0.1, 1e-3, mus)
    assert(t3 == t4)
  }

  test("thetaMax grows as the minimum budget shrinks") {
    val mus = Array(3, 4)
    val t1 = RMA.thetaMax(100, 2.0, 0.1, 0.1, 0.01, 0.1, 5.0, mus)
    val t2 = RMA.thetaMax(100, 2.0, 0.1, 0.1, 0.01, 0.1, 1.0, mus)
    assert(t2 > t1)
  }

  test("confidence bounds: lb ≤ estimate ≤ ub, and both tighten with more sets") {
    for (est <- Seq(5.0, 50.0, 500.0); scale <- Seq(0.1, 0.01)) {
      val q = 10.0
      assert(RMA.lb(est, scale, q) <= est + 1e-9)
      assert(RMA.ub(est, scale, q) >= est - 1e-9)
    }
    // smaller scale (more sets) → tighter interval
    val wide = RMA.ub(50, 0.1, 10) - RMA.lb(50, 0.1, 10)
    val tight = RMA.ub(50, 0.01, 10) - RMA.lb(50, 0.01, 10)
    assert(tight < wide)
  }

  test("lb is clamped at (numerically) zero for tiny estimates") {
    assert(RMA.lb(0.0, 0.1, 10.0) >= 0.0)
    assert(RMA.lb(0.0, 0.1, 10.0) < 1e-9)
  }

  test("seekUB never exceeds the trivial bound π̃(S*)/λ") {
    val rr = new RRCollection(4, Array(1.0))
    rr.add(0, Array(0), 1); rr.add(0, Array(1), 1); rr.add(0, Array(0, 1), 2)
    rr.rebuildIndex()
    val alloc: Alloc.Alloc = Vector(Vector(0))
    val z = RMA.seekUB(rr, alloc, None, lambda = 1.0 / 3, h = 1)
    assert(math.abs(z - Alloc.piTotal(rr, alloc) * 3) < 1e-9)
  }

  test("RMA returns a bicriteria-feasible solution on the small instance") {
    val r = RMA.run(spark, model, cpe, budgets, costs, cfg)
    for (i <- 0 until 2) {
      val pay = r.alloc(i).map(costs(i)).sum + exact.piOf(i, r.alloc(i))
      assert(pay <= (1 + cfg.rho) * budgets(i) * 1.02 + 1e-6,
        s"ad=$i pay=$pay vs ${(1 + cfg.rho) * budgets(i)}")
    }
    assert(Alloc.disjoint(r.alloc))
  }

  test("RMA achieves (λ-ε)·OPT against the brute-force optimum") {
    val exactProb = new RMProblem(exact, budgets, costs)
    val (opt, _) = BruteForce.optimal(exactProb)
    val r = RMA.run(spark, model, cpe, budgets, costs, cfg)
    val got = Alloc.piTotal(exact, r.alloc)
    assert(got >= (r.lambda - cfg.eps) * opt - 1e-6, s"got=$got opt=$opt λ=${r.lambda}")
  }

  test("RMA is deterministic in its seed") {
    val r1 = RMA.run(spark, model, cpe, budgets, costs, cfg)
    val r2 = RMA.run(spark, model, cpe, budgets, costs, cfg)
    assert(r1.alloc == r2.alloc && r1.numSets == r2.numSets)
  }

  test("RMA with SUBSIM generation returns a comparable solution") {
    val r = RMA.run(spark, model, cpe, budgets, costs, cfg.copy(subsim = true))
    val exactProb = new RMProblem(exact, budgets, costs)
    val (opt, _) = BruteForce.optimal(exactProb)
    assert(Alloc.piTotal(exact, r.alloc) >= (r.lambda - cfg.eps) * opt - 1e-6)
  }

  test("RMA diagnostics are sane") {
    val r = RMA.run(spark, model, cpe, budgets, costs, cfg)
    assert(r.iterations >= 1)
    assert(r.numSets >= r.theta0)
    assert(r.lambda == Search.lambda(2, cfg.tau))
    assert(r.millis >= 0)
  }

  test("single-advertiser RMA uses Greedy internally and stays feasible") {
    val m1 = new ExplicitModel(g, Array(probs(0)))
    val e1 = new ExactOracle(m1, Array(1.0))
    val r = RMA.run(spark, m1, Array(1.0), Array(4.0), Array(costs(0)), cfg)
    val pay = r.alloc(0).map(costs(0)).sum + e1.piOf(0, r.alloc(0))
    assert(pay <= (1 + cfg.rho) * 4.0 * 1.02 + 1e-6, s"pay=$pay")
    assert(r.lambda == 1.0 / 3)
  }

  test("RMA stops early: generated sets stay far below thetaMax on easy instances") {
    val r = RMA.run(spark, model, cpe, budgets, costs, cfg)
    assert(r.numSets < r.thetaMax,
      s"numSets=${r.numSets} thetaMax=${r.thetaMax} — progressive sampling should stop early")
  }
}
