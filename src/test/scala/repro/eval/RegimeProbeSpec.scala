package repro.eval

import repro.SparkSpec
import repro.graph.{GraphGen, InfluenceModels}
import repro.rrset.RRSource

/** Diagnostic suite: characterises the sampling regime of each TIC dataset
  * (average RR-set size ≈ expected spread of a random node — the quantity
  * that drives every algorithm's cost). Keeps the configured models safely
  * sub-critical so sample sizes stay tractable, mirroring the paper's
  * learned-probability regime where TI-* were slow but feasible.
  */
class RegimeProbeSpec extends SparkSpec {

  test("lastfm-lite RR sets stay small on average") {
    val g = GraphGen.graph(spark, GraphGen.Lastfm)
    val m = InfluenceModels.lastfmTic(g, 10)
    val c = new RRSource(spark, m, Experiments.cpes).collection(20000, seed = 31337)
    val avg = c.totalNodes.toDouble / c.numSets
    info(f"lastfm-lite avg RR size = $avg%.2f")
    assert(avg < 40.0, f"avg RR size $avg%.1f — supercritical TIC config")
  }

  test("flixster-lite RR sets stay small on average") {
    val g = GraphGen.graph(spark, GraphGen.Flixster)
    val m = InfluenceModels.flixsterTic(g, 10)
    val c = new RRSource(spark, m, Experiments.cpes).collection(20000, seed = 31337)
    val avg = c.totalNodes.toDouble / c.numSets
    info(f"flixster-lite avg RR size = $avg%.2f")
    assert(avg < 40.0, f"avg RR size $avg%.1f — supercritical TIC config")
  }
}
