package repro.baselines

import repro.SparkSpec
import repro.core.{Alloc, CostModel}
import repro.graph.{ExplicitModel, SocialGraph}

class TICARMSpec extends SparkSpec {

  // Two mid-size communities so selection is non-trivial but cheap.
  private lazy val g: SocialGraph = {
    val rng = new java.util.SplittableRandom(3)
    val pairs = (for {
      u <- 0 until 30; v <- 0 until 30
      if u != v && rng.nextDouble() < 0.08
    } yield (u, v)).toSeq
    SocialGraph.fromPairs(30, pairs)
  }
  private lazy val probs = {
    val rng = new java.util.SplittableRandom(4)
    Array.fill(2)(Array.fill(g.m)(0.1 + 0.4 * rng.nextDouble()))
  }
  private lazy val model = new ExplicitModel(g, probs)
  private lazy val cpe = Array(1.0, 1.5)
  private lazy val evalColl =
    new repro.rrset.RRSource(spark, model, cpe).collection(150000, seed = 777)

  private def sigmaTable: Array[Array[Double]] =
    Array.tabulate(2)(i => Array.tabulate(g.n)(u => evalColl.sigmaSingleton(u, i)))

  private lazy val cfg = TICARM.Config(eps = 0.3, seed = 11L)

  test("TI-CARM never overshoots any budget (conservative feasibility)") {
    val costs = CostModel.table(CostModel.Linear, 0.2, sigmaTable)
    val budgets = Array(8.0, 10.0)
    val r = TICARM.tiCarm(spark, model, cpe, budgets, costs, cfg)
    for (i <- 0 until 2) {
      val pay = r.alloc(i).map(costs(i)).sum + evalColl.piOf(i, r.alloc(i))
      assert(pay <= budgets(i) * 1.05 + 1e-6, s"ad=$i pay=$pay budget=${budgets(i)}")
    }
    assert(Alloc.disjoint(r.alloc))
  }

  test("TI-CSRM never overshoots any budget") {
    val costs = CostModel.table(CostModel.Linear, 0.2, sigmaTable)
    val budgets = Array(8.0, 10.0)
    val r = TICARM.tiCsrm(spark, model, cpe, budgets, costs, cfg)
    for (i <- 0 until 2) {
      val pay = r.alloc(i).map(costs(i)).sum + evalColl.piOf(i, r.alloc(i))
      assert(pay <= budgets(i) * 1.05 + 1e-6, s"ad=$i pay=$pay")
    }
  }

  test("under superlinear costs TI-CARM selects very few seeds (paper Fig 1/3 behaviour)") {
    val costs = CostModel.table(CostModel.SuperLinear, 0.4, sigmaTable)
    val budgets = Array(8.0, 10.0)
    val ca = TICARM.tiCarm(spark, model, cpe, budgets, costs, cfg)
    val cs = TICARM.tiCsrm(spark, model, cpe, budgets, costs, cfg)
    assert(Alloc.seedCount(ca.alloc) <= Alloc.seedCount(cs.alloc),
      s"CA=${Alloc.seedCount(ca.alloc)} CS=${Alloc.seedCount(cs.alloc)}")
  }

  test("runs are deterministic in the seed") {
    val costs = CostModel.table(CostModel.Linear, 0.2, sigmaTable)
    val budgets = Array(6.0, 6.0)
    val a = TICARM.tiCarm(spark, model, cpe, budgets, costs, cfg)
    val b = TICARM.tiCarm(spark, model, cpe, budgets, costs, cfg)
    assert(a.alloc == b.alloc)
  }

  test("diagnostics: sets generated and regenerations are positive") {
    val costs = CostModel.table(CostModel.Linear, 0.2, sigmaTable)
    val r = TICARM.tiCsrm(spark, model, cpe, Array(6.0, 6.0), costs, cfg)
    assert(r.totalSetsGenerated > 0)
    assert(r.peakSets > 0)
    assert(r.regenerations >= 2) // at least the initial generation per ad
    assert(r.millis >= 0)
  }

  test("tiny budgets yield empty or near-empty allocations, never infeasible ones") {
    val costs = CostModel.table(CostModel.Linear, 0.2, sigmaTable)
    val budgets = Array(0.5, 0.5)
    val r = TICARM.tiCarm(spark, model, cpe, budgets, costs, cfg)
    for (i <- 0 until 2) {
      val pay = r.alloc(i).map(costs(i)).sum + evalColl.piOf(i, r.alloc(i))
      assert(pay <= budgets(i) * 1.1 + 1e-6)
    }
  }

  test("memory proxy grows with smaller eps (paper Fig 4 shape)") {
    val costs = CostModel.table(CostModel.Linear, 0.2, sigmaTable)
    val budgets = Array(6.0, 8.0)
    val loose = TICARM.tiCarm(spark, model, cpe, budgets, costs, cfg.copy(eps = 0.4))
    val tight = TICARM.tiCarm(spark, model, cpe, budgets, costs, cfg.copy(eps = 0.15))
    assert(tight.peakSets > loose.peakSets,
      s"tight=${tight.peakSets} loose=${loose.peakSets}")
  }
}
