package repro.core

/** Abstraction the paper's algorithms run against: a revenue function
  * `π_i(·) = cpe(i)·σ_i(·)` per advertiser, with an incremental-session API
  * for greedy selection.
  *
  * Two implementations exist:
  *   - [[repro.rrset.RRCollection]] — the sampled estimator `π̃(·, R)` of §4
  *     (also used as the "oracle" of §3 with a very large fixed `R`);
  *   - [[ExactOracle]] — brute-force exact spread on tiny graphs, used by
  *     tests to validate the §3 approximation guarantees.
  */
trait RevenueOracle {
  /** Number of nodes in the network. */
  def n: Int

  /** Number of advertisers. */
  def h: Int

  /** Cost-per-engagement of advertiser `i`. */
  def cpe(i: Int): Double

  /** `π_i(X)` evaluated from scratch for an arbitrary seed set `X`. */
  def piOf(i: Int, xs: Iterable[Int]): Double

  /** Fresh incremental session starting from the empty allocation. */
  def newSession(): RevenueSession

  /** `π(S⃗) = Σ_i π_i(S_i)` for a full allocation. */
  def piTotal(alloc: IndexedSeq[Iterable[Int]]): Double = {
    var s = 0.0
    var i = 0
    while (i < h) { s += piOf(i, alloc(i).toSeq); i += 1 }
    s
  }
}

/** Incremental marginal-gain engine over a growing allocation `S⃗`.
  *
  * Guarantee required by the lazy-heap greedy implementations: `gain(u, i)`
  * is non-increasing over the lifetime of the session (submodularity of
  * `π_i`, which holds exactly for coverage estimators and for the exact
  * TIC spread).
  */
trait RevenueSession {
  /** `π_i(u | S_i)` under the current allocation. */
  def gain(u: Int, i: Int): Double

  /** Commit `u` to `S_i`. */
  def add(u: Int, i: Int): Unit

  /** `π_i(S_i)` under the current allocation. */
  def pi(i: Int): Double

  /** Marginal rate `ζ_i(u | S_i) = g/(c + g)` for seed cost `c = cost(i)(u)`. */
  final def rate(u: Int, i: Int, cost: Double): Double = {
    val g = gain(u, i)
    if (cost + g <= 0) 0.0 else g / (cost + g)
  }
}
