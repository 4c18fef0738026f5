package repro.core

/** Seed-incentive (node seeding cost) models of §5.1.
  *
  * All three price node u for advertiser i as a function of its singleton
  * spread `σ_i({u})` with coefficient α:
  *   Linear       c_i(u) = α·σ
  *   QuasiLinear  c_i(u) = α·σ·ln σ
  *   SuperLinear  c_i(u) = α·σ²
  *
  * σ is clamped below at 1 (a seed always activates itself) and costs are
  * floored at a tiny positive value so marginal rates stay well-defined.
  */
sealed abstract class CostModel(val name: String) {
  def cost(alpha: Double, sigma: Double): Double = {
    val s = math.max(1.0, sigma)
    math.max(1e-9, raw(alpha, s))
  }
  protected def raw(alpha: Double, s: Double): Double
}

object CostModel {
  case object Linear extends CostModel("linear") {
    protected def raw(a: Double, s: Double): Double = a * s
  }
  case object QuasiLinear extends CostModel("quasilinear") {
    protected def raw(a: Double, s: Double): Double = a * s * math.log(s)
  }
  case object SuperLinear extends CostModel("superlinear") {
    protected def raw(a: Double, s: Double): Double = a * s * s
  }

  val all: Seq[CostModel] = Seq(Linear, QuasiLinear, SuperLinear)

  /** Build the h×n cost table from a singleton-spread table `sigma(i)(u)`. */
  def table(model: CostModel, alpha: Double, sigma: Array[Array[Double]]): Array[Array[Double]] =
    sigma.map(_.map(s => model.cost(alpha, s)))
}
