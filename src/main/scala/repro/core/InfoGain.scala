package repro.core

import repro.core.MathUtil._

/** Inherent information gain (paper §5.1): the expected drop in the entropy
  * of a cell's truth distribution if the incoming worker answers it. Shannon
  * entropy for categorical cells, differential entropy for continuous cells —
  * the *delta* makes the two comparable (the paper's discretization
  * argument), so a single ranking covers both datatypes.
  */
object InfoGain {

  /** Gain for a continuous cell. The Gaussian posterior-variance update
    * `1/phi' = 1/phi + 1/v` does not depend on the answer value, so the
    * expectation in Eq. 6 collapses to the closed form
    * `0.5 * ln(1 + tPhi / answerVar)` — unit-tested against brute-force
    * re-inference.
    *
    * @param tPhi      current truth-posterior variance of the cell
    * @param answerVar variance of the worker's answer on this cell
    *                  (`alpha_i * beta_j * phi_u`, or the structure-aware
    *                  replacement)
    */
  def continuousGain(tPhi: Double, answerVar: Double): Double =
    0.5 * math.log1p(math.max(tPhi, 1e-300) / math.max(answerVar, 1e-12))

  /** Gain for a categorical cell: exact expectation over the worker's
    * predictive answer distribution.
    *
    * @param probs current truth posterior over the label set
    * @param q     probability the worker answers this cell correctly
    */
  def categoricalGain(probs: Array[Double], q: Double): Double = {
    val l = probs.length
    if (l < 2) return 0.0
    val qc = clampProb(q)
    val wrong = (1.0 - qc) / (l - 1)
    val h0 = shannonEntropy(probs)
    var expected = 0.0
    var z = 0
    while (z < l) {
      // predictive probability of answer z
      val pa = probs(z) * qc + (1.0 - probs(z)) * wrong
      if (pa > 1e-15) {
        // posterior over truth t given answer z
        var norm = 0.0
        val post = new Array[Double](l)
        var t = 0
        while (t < l) {
          val lik = if (t == z) qc else wrong
          post(t) = probs(t) * lik
          norm += post(t)
          t += 1
        }
        t = 0
        while (t < l) { post(t) /= norm; t += 1 }
        expected += pa * shannonEntropy(post)
      }
      z += 1
    }
    h0 - expected
  }

  /** Uniform entropy `H(T_ij)` of §5.1 (for the Entropy heuristic, which the
    * paper shows is biased toward continuous cells).
    */
  def uniformEntropy(isCategorical: Boolean, probs: Array[Double], tPhi: Double): Double =
    if (isCategorical) shannonEntropy(probs) else differentialEntropy(tPhi)

  /** Inherent gain of assigning cell (i,j) to worker u, from an inference
    * snapshot (paper Eq. 6).
    */
  def inherentGain(res: TCrowdResult, labelCount: Map[Int, Int], priorVar: Double)(
      u: Int, i: Int, j: Int): Double = {
    val v = res.cellVariance(u, i, j)
    labelCount.get(j).filter(_ > 0) match {
      case Some(l) =>
        val probs = res.catPosterior.getOrElse((i, j), Array.fill(l)(1.0 / l))
        categoricalGain(probs, quality(res.eps, v))
      case None =>
        val tPhi = res.contPosterior.get((i, j)).map(_._2).getOrElse(priorVar)
        continuousGain(tPhi, v)
    }
  }
}
