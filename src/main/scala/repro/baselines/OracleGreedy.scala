package repro.baselines

import repro.core.{DoubleIntHeap, RMProblem}
import repro.core.Alloc.Alloc

/** Aslay et al.'s oracle-mode baselines (§2.2):
  *
  *   - CA-Greedy (cost-agnostic): at each step select the element (u,i) with
  *     maximum marginal gain `π_i(u|S_i)`.
  *   - CS-Greedy (cost-sensitive): select by maximum marginal rate
  *     `ζ_i(u|S_i)`.
  *
  * Both respect the partition matroid (a node endorses one ad) and the
  * per-advertiser submodular knapsack `c_i(S_i)+π_i(S_i) ≤ B_i`. When the
  * chosen best element for advertiser i violates the budget, advertiser i's
  * selection terminates (the behaviour the paper's §5.2 analysis of
  * TI-CARM's superlinear-cost collapse describes).
  */
object OracleGreedy {

  def run(prob: RMProblem, costSensitive: Boolean): Alloc = {
    val n = prob.n; val h = prob.h
    val sess = prob.oracle.newSession()
    val assigned = new Array[Boolean](n)
    val terminated = new Array[Boolean](h)
    val costS = new Array[Double](h)
    val out = Array.fill(h)(Vector.newBuilder[Int])
    var active = h

    val heap = new DoubleIntHeap(n * h)
    def key(u: Int, i: Int): Double =
      if (costSensitive) sess.rate(u, i, prob.costs(i)(u)) else sess.gain(u, i)
    var i = 0
    while (i < h) {
      var u = 0
      while (u < n) {
        if (prob.elementFeasible(i, u)) heap.push(key(u, i), i * n + u)
        u += 1
      }
      i += 1
    }

    while (heap.nonEmpty && active > 0) {
      val e = heap.topElem
      heap.removeTop()
      val ad = e / n; val u = e % n
      if (!terminated(ad) && !assigned(u)) {
        val k = key(u, ad)
        if (heap.nonEmpty && k < heap.topKey - 1e-12) {
          heap.push(k, e)
        } else {
          val g = sess.gain(u, ad)
          val c = prob.costs(ad)(u)
          if (costS(ad) + c + sess.pi(ad) + g <= prob.budgets(ad) + 1e-9) {
            sess.add(u, ad)
            costS(ad) += c
            out(ad) += u
            assigned(u) = true
          } else {
            terminated(ad) = true
            active -= 1
          }
        }
      }
    }
    Vector.tabulate(h)(j => out(j).result())
  }

  def caGreedy(prob: RMProblem): Alloc = run(prob, costSensitive = false)
  def csGreedy(prob: RMProblem): Alloc = run(prob, costSensitive = true)
}
