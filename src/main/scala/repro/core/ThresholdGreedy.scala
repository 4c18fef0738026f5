package repro.core

import Alloc.Alloc

/** Algorithms 2 & 3 — ThresholdGreedy(γ) and Fill.
  *
  * ThresholdGreedy selects by maximum marginal *gain* but only accepts
  * elements whose marginal *rate* clears `γ/B_i`; the first over-budget node
  * per advertiser is the stopple `D_i` and depletes that advertiser
  * (`I`/`b` count the depleted ones). If exactly one advertiser depleted,
  * a fallback `Greedy` run provides `A_i`; each advertiser keeps the best of
  * `{S_i, D_i, A_i}` and `Fill` then greedily (by rate) tops up every
  * advertiser whose budget is not yet depleted.
  */
object ThresholdGreedy {

  /** Result: the allocation after Fill, and `b` = number of advertisers whose
    * budget was depleted during the threshold phase.
    */
  final case class TGResult(alloc: Alloc, b: Int)

  def run(prob: RMProblem, gamma: Double): TGResult = {
    val n = prob.n; val h = prob.h
    val oracle = prob.oracle
    val sess = oracle.newSession()

    val assigned = new Array[Boolean](n) // in ∪_j (S_j ∪ D_j)
    val dOf = Array.fill(h)(-1)          // stopple node per advertiser
    val sLists = Array.fill(h)(Vector.newBuilder[Int])
    val costS = new Array[Double](h)
    var depleted = 0

    // M: all individually feasible elements, keyed by marginal gain.
    val heap = new DoubleIntHeap(n * h)
    var i = 0
    while (i < h) {
      var u = 0
      while (u < n) {
        if (prob.elementFeasible(i, u)) heap.push(prob.singletonPi(i)(u), i * n + u)
        u += 1
      }
      i += 1
    }

    while (heap.nonEmpty && depleted != h) {
      val e = heap.topElem
      heap.removeTop()
      val ad = e / n; val u = e % n
      val g = sess.gain(u, ad)
      if (heap.nonEmpty && g < heap.topKey - 1e-12) {
        heap.push(g, e) // stale — refresh
      } else {
        // (u, ad) is the max-marginal-gain element of M; it is now removed.
        val c = prob.costs(ad)(u)
        val rate = if (c + g <= 0) 0.0 else g / (c + g)
        val thresholdOk = rate >= gamma / prob.budgets(ad) - 1e-12
        if (thresholdOk && dOf(ad) < 0 && !assigned(u)) {
          if (costS(ad) + c + sess.pi(ad) + g <= prob.budgets(ad) + 1e-9) {
            sess.add(u, ad)
            costS(ad) += c
            sLists(ad) += u
            assigned(u) = true
          } else {
            dOf(ad) = u
            assigned(u) = true
            depleted += 1
          }
        }
      }
    }

    val s: Array[IndexedSeq[Int]] = sLists.map(_.result())
    val b = depleted

    // Line 9–10: single-depleted fallback Greedy over V minus all S_j.
    val aFallback: Array[IndexedSeq[Int]] = Array.fill(h)(Vector.empty)
    if (b == 1) {
      val ad = dOf.indexWhere(_ >= 0)
      val inS = new Array[Boolean](n)
      s.foreach(_.foreach(inS(_) = true))
      val candidates = (0 until n).filter(!inS(_)).toVector
      aFallback(ad) = Greedy.run(prob, candidates, ad)
    }

    // Line 11: per advertiser keep the best of {S_j, D_j, A_j}.
    val sPrime: Alloc = Vector.tabulate(h) { j =>
      val options = Seq(
        s(j),
        if (dOf(j) >= 0) Vector(dOf(j)) else Vector.empty[Int],
        aFallback(j),
      )
      options.maxBy(x => oracle.piOf(j, x))
    }

    TGResult(fill(prob, sPrime), b)
  }

  /** Algorithm 3 — Fill(S⃗): greedy top-up by marginal rate until all budgets
    * are depleted or no feasible element remains.
    */
  def fill(prob: RMProblem, start: Alloc): Alloc = {
    val n = prob.n; val h = prob.h
    val sess = prob.oracle.newSession()
    val assigned = new Array[Boolean](n)
    val costS = new Array[Double](h)
    val out = Array.tabulate(h)(i => Vector.newBuilder[Int] ++= start(i))
    var i = 0
    while (i < h) {
      for (u <- start(i)) {
        sess.add(u, i)
        costS(i) += prob.costs(i)(u)
        assigned(u) = true
      }
      i += 1
    }
    val heap = new DoubleIntHeap(n * h)
    i = 0
    while (i < h) {
      var u = 0
      while (u < n) {
        if (prob.elementFeasible(i, u))
          heap.push(sess.rate(u, i, prob.costs(i)(u)), i * n + u)
        u += 1
      }
      i += 1
    }
    while (heap.nonEmpty) {
      val e = heap.topElem
      heap.removeTop()
      val ad = e / n; val u = e % n
      val r = sess.rate(u, ad, prob.costs(ad)(u))
      if (heap.nonEmpty && r < heap.topKey - 1e-12) {
        heap.push(r, e)
      } else {
        val g = sess.gain(u, ad)
        val c = prob.costs(ad)(u)
        if (!assigned(u) && costS(ad) + c + sess.pi(ad) + g <= prob.budgets(ad) + 1e-9) {
          sess.add(u, ad)
          costS(ad) += c
          out(ad) += u
          assigned(u) = true
        }
        // element removed from M either way
      }
    }
    Vector.tabulate(h)(j => out(j).result())
  }
}
