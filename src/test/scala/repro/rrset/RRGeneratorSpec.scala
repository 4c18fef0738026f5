package repro.rrset

import repro.SparkSpec
import repro.core.ExactOracle
import repro.graph.{ExplicitModel, SocialGraph}

class RRGeneratorSpec extends SparkSpec {

  // Small probabilistic graph: 0→1 (.5), 1→2 (.5), 0→3 (.25), 3→2 (1.0)
  private lazy val g = SocialGraph.fromPairs(4, Seq((0, 1), (1, 2), (0, 3), (3, 2)))
  private def probOf(i: Int): Array[Double] = {
    // edge-id order is sorted (src,dst): (0,1),(0,3),(1,2),(3,2)
    Array(0.5, 0.25, 0.5, 1.0)
  }
  private lazy val model = new ExplicitModel(g, Array(probOf(0), probOf(1)))
  private lazy val cpe = Array(1.0, 3.0)
  private lazy val source = new RRSource(spark, model, cpe)

  test("deterministic: same seed gives identical collections") {
    val c1 = source.collection(2000, seed = 5)
    val c2 = source.collection(2000, seed = 5)
    assert(c1.numSets == c2.numSets && c1.totalNodes == c2.totalNodes)
    assert((0 until c1.numSets).forall(s => c1.tagOf(s) == c2.tagOf(s)))
    assert((0 until c1.numSets).forall(s => c1.setMembers(s).toSeq == c2.setMembers(s).toSeq))
  }

  test("different seeds give different collections") {
    val c1 = source.collection(2000, seed = 5)
    val c2 = source.collection(2000, seed = 6)
    assert(c1.totalNodes != c2.totalNodes ||
      (0 until c1.numSets).exists(s => c1.setMembers(s).toSeq != c2.setMembers(s).toSeq))
  }

  test("advertiser tags are cpe-proportional (uniform sampling, §4.2)") {
    val c = source.collection(40000, seed = 1)
    val tag1 = (0 until c.numSets).count(c.tagOf(_) == 1)
    val frac = tag1.toDouble / c.numSets
    assert(math.abs(frac - 0.75) < 0.02, s"tag-1 fraction=$frac, expected 0.75") // cpe 3 of Γ=4
  }

  test("every RR set contains its root and only valid nodes") {
    val c = source.collection(5000, seed = 2)
    for (s <- 0 until c.numSets) {
      val ms = c.setMembers(s)
      assert(ms.nonEmpty)
      assert(ms.forall(u => u >= 0 && u < g.n))
      assert(ms.distinct.length == ms.length, "no duplicates within a set")
    }
  }

  test("deterministic edges always traversed: RR set from node 2 contains 3") {
    // 3→2 has p=1, so any RR set rooted at 2 must include 3.
    val c = source.collection(5000, seed = 3)
    for (s <- 0 until c.numSets) {
      val ms = c.setMembers(s).toSet
      if (ms.contains(2)) assert(ms.contains(3), s"set $s: $ms")
    }
  }

  test("estimator is unbiased: π̃ matches the exact oracle within 3 sigma") {
    val oracle = new ExactOracle(model, cpe)
    val c = source.collection(200000, seed = 4)
    for (i <- 0 until 2; seedSet <- Seq(Seq(0), Seq(2), Seq(0, 2), Seq(1, 3))) {
      val exact = oracle.piOf(i, seedSet)
      val est = c.piOf(i, seedSet)
      // Var of the per-set Bernoulli ≤ p(1-p); revenue units nΓ
      val se = c.scalePerSet * math.sqrt(c.numSets * 0.25)
      assert(math.abs(est - exact) < 3 * se + 0.05 * exact + 1e-6,
        s"ad=$i seeds=$seedSet est=$est exact=$exact")
    }
  }

  test("estimator total matches summed per-ad estimates") {
    val c = source.collection(50000, seed = 8)
    val alloc = Vector(Vector(0), Vector(2))
    val total = (0 until 2).map(i => c.piOf(i, alloc(i))).sum
    assert(total > 0)
  }

  test("SUBSIM generation agrees with naive generation in distribution") {
    val cNaive = source.collection(150000, seed = 10, subsim = false)
    val cSub = source.collection(150000, seed = 11, subsim = true)
    for (i <- 0 until 2; u <- 0 until g.n) {
      val a = cNaive.sigmaSingleton(u, i)
      val b = cSub.sigmaSingleton(u, i)
      assert(math.abs(a - b) < 0.08 * math.max(1.0, math.max(a, b)) + 0.05,
        s"ad=$i node=$u naive=$a subsim=$b")
    }
  }

  test("appendTo grows an existing collection and re-indexes") {
    val c = source.collection(1000, seed = 20)
    val before = c.numSets
    source.appendTo(c, 1000, seed = 21)
    assert(c.numSets == before + 1000)
    assert(c.piOf(0, Seq(0)) >= 0)
  }

  test("appendTo with zero sets is a no-op") {
    val c = source.collection(500, seed = 22)
    source.appendTo(c, 0, seed = 23)
    assert(c.numSets == 500)
  }

  test("single-node graph yields singleton RR sets") {
    val g1 = SocialGraph.fromPairs(2, Seq((0, 1)))
    val m1 = new ExplicitModel(g1, Array(Array(0.0)))
    val s1 = new RRSource(spark, m1, Array(1.0))
    val c = s1.collection(1000, seed = 1)
    assert((0 until c.numSets).forall(s => c.setMembers(s).length == 1))
  }

  test("p=1 chain: RR sets contain all ancestors of the root") {
    val gc = SocialGraph.fromPairs(4, Seq((0, 1), (1, 2), (2, 3)))
    val mc = new ExplicitModel(gc, Array(Array(1.0, 1.0, 1.0)))
    val sc = new RRSource(spark, mc, Array(1.0))
    val c = sc.collection(2000, seed = 2)
    for (s <- 0 until c.numSets) {
      val ms = c.setMembers(s).toSet
      val root = c.setMembers(s)(0)
      assert(ms == (0 to root).toSet, s"root=$root ms=$ms")
    }
  }

  test("SUBSIM on p=1 graph still reaches all ancestors (maxP≈1 fallback)") {
    val gc = SocialGraph.fromPairs(3, Seq((0, 1), (1, 2)))
    val mc = new ExplicitModel(gc, Array(Array(1.0, 1.0)))
    val sc = new RRSource(spark, mc, Array(1.0))
    val c = sc.collection(1000, seed = 3, subsim = true)
    for (s <- 0 until c.numSets) {
      val root = c.setMembers(s)(0)
      assert(c.setMembers(s).toSet == (0 to root).toSet)
    }
  }
}
