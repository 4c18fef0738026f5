package repro.graph

import repro.SparkSpec
import repro.core.ExactOracle

class ForwardSimSpec extends SparkSpec {

  test("deterministic chain: forward sim equals exact reachability") {
    val g = SocialGraph.fromPairs(4, Seq((0, 1), (1, 2), (2, 3)))
    val m = new ExplicitModel(g, Array(Array(1.0, 1.0, 1.0)))
    val s = ForwardSim.sigma(spark, m, 0, Set(0), trials = 64, seed = 1)
    assert(math.abs(s - 4.0) < 1e-9)
    assert(math.abs(ForwardSim.sigma(spark, m, 0, Set(2), 64, 1) - 2.0) < 1e-9)
  }

  test("zero-probability edges never propagate") {
    val g = SocialGraph.fromPairs(3, Seq((0, 1), (1, 2)))
    val m = new ExplicitModel(g, Array(Array(0.0, 0.0)))
    assert(ForwardSim.sigma(spark, m, 0, Set(0), 64, 2) == 1.0)
  }

  test("empty seed set has zero spread") {
    val g = SocialGraph.fromPairs(2, Seq((0, 1)))
    val m = new ExplicitModel(g, Array(Array(1.0)))
    assert(ForwardSim.sigma(spark, m, 0, Set.empty, 64, 3) == 0.0)
  }

  test("probabilistic edge: MC estimate matches exact within tolerance") {
    val g = SocialGraph.fromPairs(2, Seq((0, 1)))
    val m = new ExplicitModel(g, Array(Array(0.3)))
    val est = ForwardSim.sigma(spark, m, 0, Set(0), trials = 6400, seed = 4)
    assert(math.abs(est - 1.3) < 0.05, s"est=$est")
  }

  test("MC estimate on a diamond matches the exact oracle") {
    // 0→1 (.5), 0→2 (.5), 1→3 (.5), 2→3 (.5)
    val g = SocialGraph.fromPairs(4, Seq((0, 1), (0, 2), (1, 3), (2, 3)))
    val m = new ExplicitModel(g, Array(Array(0.5, 0.5, 0.5, 0.5)))
    val oracle = new ExactOracle(m, Array(1.0))
    val exact = oracle.sigma(0, Seq(0))
    val est = ForwardSim.sigma(spark, m, 0, Set(0), trials = 6400, seed = 5)
    assert(math.abs(est - exact) < 0.08 * exact + 0.05, s"est=$est exact=$exact")
  }

  test("monotone: superset of seeds never spreads less") {
    val g = SocialGraph.fromPairs(4, Seq((0, 1), (1, 2), (2, 3)))
    val m = new ExplicitModel(g, Array(Array(0.5, 0.5, 0.5)))
    val a = ForwardSim.sigma(spark, m, 0, Set(1), 640, 6)
    val b = ForwardSim.sigma(spark, m, 0, Set(0, 1), 640, 6)
    assert(b >= a - 1e-9)
  }

  test("forward sim cross-checks the RR estimator on a small TIC-style model") {
    val g = SocialGraph.fromPairs(5, Seq((0, 1), (0, 2), (1, 3), (2, 3), (3, 4)))
    val probs = Array(Array(0.4, 0.6, 0.3, 0.5, 0.7))
    val m = new ExplicitModel(g, probs)
    val rr = new repro.rrset.RRSource(spark, m, Array(1.0)).collection(100000, seed = 7)
    val sigRR = rr.piOf(0, Seq(0)) // cpe=1 → σ̂
    val sigMC = ForwardSim.sigma(spark, m, 0, Set(0), trials = 6400, seed = 8)
    assert(math.abs(sigRR - sigMC) < 0.1 * math.max(sigRR, sigMC) + 0.1,
      s"rr=$sigRR mc=$sigMC")
  }

  test("deterministic in seed") {
    val g = SocialGraph.fromPairs(3, Seq((0, 1), (1, 2)))
    val m = new ExplicitModel(g, Array(Array(0.5, 0.5)))
    val a = ForwardSim.sigma(spark, m, 0, Set(0), 128, 42)
    val b = ForwardSim.sigma(spark, m, 0, Set(0), 128, 42)
    assert(a == b)
  }
}
