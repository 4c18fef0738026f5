package repro

import repro.baselines.TICARM
import repro.core.{Alloc, CostModel, RMA}
import repro.graph.{ExplicitModel, SocialGraph}
import repro.rrset.RRSource

/** End-to-end comparison on one mid-size random instance: the three practical
  * algorithms (RMA, TI-CARM, TI-CSRM) run on the same problem and are scored
  * on the same independent collection, checking the paper's headline claims
  * at miniature scale.
  */
class IntegrationSpec extends SparkSpec {

  private lazy val g: SocialGraph = {
    val rng = new java.util.SplittableRandom(21)
    val pairs = (for {
      u <- 0 until 60; v <- 0 until 60
      if u != v && rng.nextDouble() < 0.05
    } yield (u, v)).toSeq
    SocialGraph.fromPairs(60, pairs)
  }
  private lazy val model: ExplicitModel = {
    val rng = new java.util.SplittableRandom(22)
    new ExplicitModel(g, Array.fill(3)(Array.fill(g.m)(0.05 + 0.35 * rng.nextDouble())))
  }
  private lazy val cpe = Array(1.0, 1.5, 2.0)
  private lazy val source = new RRSource(spark, model, cpe)
  private lazy val evalColl = source.collection(200000, seed = 5151)
  private lazy val sigma =
    Array.tabulate(3)(i => Array.tabulate(g.n)(u => evalColl.sigmaSingleton(u, i)))
  private lazy val costs = CostModel.table(CostModel.Linear, 0.2, sigma)
  private lazy val budgets = Array(15.0, 20.0, 25.0)
  private val rho = 0.1

  private lazy val rmaRun = RMA.run(spark, model, cpe,
    budgets.map(_ / (1 + rho)), costs,
    RMA.Config(eps = 0.05, delta = 1.0 / 60, tau = 0.1, rho = rho, seed = 9L))
  private lazy val caRun = TICARM.tiCarm(spark, model, cpe, budgets, costs,
    TICARM.Config(eps = 0.1, seed = 13L))
  private lazy val csRun = TICARM.tiCsrm(spark, model, cpe, budgets, costs,
    TICARM.Config(eps = 0.1, seed = 13L))

  private def revenue(a: Alloc.Alloc): Double =
    (0 until 3).map(i => evalColl.piOf(i, a(i))).sum
  private def payment(a: Alloc.Alloc, i: Int): Double =
    a(i).map(costs(i)).sum + evalColl.piOf(i, a(i))

  test("all three algorithms produce disjoint allocations") {
    assert(Alloc.disjoint(rmaRun.alloc))
    assert(Alloc.disjoint(caRun.alloc))
    assert(Alloc.disjoint(csRun.alloc))
  }

  test("RMA stays within the common budget (its bicriteria bound equals the baselines' input)") {
    for (i <- 0 until 3)
      assert(payment(rmaRun.alloc, i) <= budgets(i) * 1.05 + 1e-6,
        s"ad=$i pay=${payment(rmaRun.alloc, i)} budget=${budgets(i)}")
  }

  test("baselines stay within their budgets") {
    for (i <- 0 until 3) {
      assert(payment(caRun.alloc, i) <= budgets(i) * 1.05 + 1e-6)
      assert(payment(csRun.alloc, i) <= budgets(i) * 1.05 + 1e-6)
    }
  }

  test("RMA's revenue is competitive with the best baseline (paper: it wins)") {
    val rma = revenue(rmaRun.alloc)
    val best = math.max(revenue(caRun.alloc), revenue(csRun.alloc))
    assert(rma >= 0.85 * best, s"rma=$rma bestBaseline=$best")
  }

  test("nonzero revenue is achieved by everyone on this easy instance") {
    assert(revenue(rmaRun.alloc) > 0)
    assert(revenue(caRun.alloc) > 0)
    assert(revenue(csRun.alloc) > 0)
  }

  test("RMA's rate of return is at least the baselines' (paper Fig 6 shape)") {
    def ror(a: Alloc.Alloc): Double = {
      val r = revenue(a)
      val c = (0 until 3).map(i => a(i).map(costs(i)).sum).sum
      if (r + c == 0) 0 else r / (r + c)
    }
    val r = ror(rmaRun.alloc)
    assert(r >= math.min(ror(caRun.alloc), ror(csRun.alloc)) - 0.05,
      s"rma=$r ca=${ror(caRun.alloc)} cs=${ror(csRun.alloc)}")
  }

  test("RMA uses far fewer RR sets than the TIM baselines (efficiency claim)") {
    assert(2L * rmaRun.numSets < csRun.totalSetsGenerated,
      s"rma=${2L * rmaRun.numSets} csrm=${csRun.totalSetsGenerated}")
  }
}
