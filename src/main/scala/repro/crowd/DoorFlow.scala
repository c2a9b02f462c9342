package repro.crowd

import scala.util.Random

/** Poisson door-flow machinery (Section 3.2).
  *
  * A door flow function `f(v_i, v_j, d_k)` maps each report timestamp of
  * `d_k` to the expected number of objects flowing from `v_i` to `v_j` over
  * the following report interval, modeled as `Poisson(λ)`. The paper fits λ
  * on a recent window of observed flows; the MLE for a Poisson rate is the
  * sample mean, which is what [[fitLambda]] does.
  */
object DoorFlow {

  /** MLE of a Poisson rate from observed per-interval flows. */
  def fitLambda(history: Seq[Double]): Double = {
    require(history.nonEmpty, "cannot fit λ on an empty history")
    math.max(0.0, history.sum / history.size)
  }

  /** Knuth's Poisson sampler — λ in this paper is ≤ 3, where it is exact and
    * fast; guard against pathological rates anyway.
    */
  def samplePoisson(lambda: Double, rng: Random): Int = {
    require(lambda >= 0, s"negative λ $lambda")
    if (lambda == 0) 0
    else if (lambda > 30) { // normal approximation for large rates
      math.max(0, math.round(lambda + math.sqrt(lambda) * rng.nextGaussian()).toInt)
    } else {
      val l = math.exp(-lambda)
      var k = 0
      var p = 1.0
      while ({ p *= rng.nextDouble(); p > l }) k += 1
      k
    }
  }
}
