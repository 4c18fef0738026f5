package repro.baselines

import repro.graph.{InfluenceModel, SocialGraph}
import repro.rrset.{RRCollection, RRSource}

/** Single-advertiser view of a multi-advertiser influence model — the
  * TIM-based baselines keep one RR-set collection per advertiser.
  */
final class SingleAdModel(base: InfluenceModel, ad: Int) extends InfluenceModel {
  def h: Int = 1
  def graph: SocialGraph = base.graph
  def prob(i: Int): Array[Double] = base.prob(ad)
}

/** TIM (Tang et al. [67]) sample-size machinery, used by TI-CARM / TI-CSRM
  * exactly as Aslay et al. [5] used it: a KPT lower-bound estimation for
  * OPT_k followed by θ = (8+2ε)·n·(ℓ·ln n + ln C(n,k) + ln 2)/(ε²·KPT).
  */
object TIM {

  /** ln C(n, k) via log-gamma. */
  def logNChooseK(n: Int, k: Int): Double = {
    val kk = math.min(k, n)
    lgamma(n + 1.0) - lgamma(kk + 1.0) - lgamma(n - kk + 1.0)
  }

  private def lgamma(x: Double): Double = {
    // Lanczos approximation — plenty for sample-size formulas.
    val g = 7.0
    val c = Array(0.99999999999980993, 676.5203681218851, -1259.1392167224028,
      771.32342877765313, -176.61502916214059, 12.507343278686905,
      -0.13857109526572012, 9.9843695780195716e-6, 1.5056327351493116e-7)
    if (x < 0.5) math.log(math.Pi / math.sin(math.Pi * x)) - lgamma(1 - x)
    else {
      val xx = x - 1
      var a = c(0)
      val t = xx + g + 0.5
      for (i <- 1 until 9) a += c(i) / (xx + i)
      0.5 * math.log(2 * math.Pi) + (xx + 0.5) * math.log(t) - t + math.log(a)
    }
  }

  /** TIM's KptEstimation (Algorithm 2 of [67]): returns a lower bound on
    * OPT_k = max spread of k seeds, estimated from RR-set widths. Also
    * returns the number of RR sets it generated (they count toward the
    * baseline's running time, as in [5]).
    */
  def kptEstimate(source: RRSource, graph: SocialGraph, k: Int, ell: Double,
                  seed: Long, subsim: Boolean): (Double, Long) = {
    val n = graph.n
    val m = graph.m
    val log2n = math.max(1.0, math.log(n.toDouble) / math.log(2.0))
    var generated = 0L
    var i = 1
    while (i < log2n.toInt) {
      val ci = math.max(1L, ((6 * ell * math.log(n.toDouble) + 6 * math.log(log2n)) * (1L << i)).toLong)
      val coll = new RRCollection(n, Array(1.0))
      source.appendTo(coll, math.min(ci, 1_000_000L).toInt, seed + i, subsim)
      generated += coll.numSets
      var sumKappa = 0.0
      var sid = 0
      while (sid < coll.numSets) {
        var w = 0L
        var p = coll.setStart(sid)
        while (p < coll.setEnd(sid)) { w += graph.inDegree(coll.memberAt(p)); p += 1 }
        sumKappa += 1 - math.pow(1 - w.toDouble / m, k)
        sid += 1
      }
      if (sumKappa / coll.numSets > 1.0 / (1L << i)) {
        return (n * sumKappa / (2 * coll.numSets), generated)
      }
      i += 1
    }
    (1.0, generated)
  }

  /** TIM's RR-sample size for an ε-approximate size-k selection. */
  def theta(n: Int, k: Int, kpt: Double, eps: Double, ell: Double): Long = {
    val lam = (8 + 2 * eps) * n *
      (ell * math.log(n.toDouble) + logNChooseK(n, k) + math.log(2.0))
    math.max(256L, (lam / (eps * eps * math.max(1.0, kpt))).toLong)
  }
}
