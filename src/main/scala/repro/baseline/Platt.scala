package repro.baseline

import repro.core.{LBFGS, Linalg}

/** Platt scaling (Platt 2000): fit p(y=1|s) = sigmoid(A·s + B) on labeled
  * scores by regularized maximum likelihood. Used for the Table 4
  * calibration experiment — the paper stresses this needs ground-truth
  * labels ahead of time, so it is a diagnostic, not a deployable method.
  */
final case class PlattModel(a: Double, b: Double) {
  def probability(score: Double): Double = {
    val z = a * score + b
    if (z >= 0) 1.0 / (1.0 + math.exp(-z)) else { val e = math.exp(z); e / (1.0 + e) }
  }
}

object Platt {

  /** Fit (A, B) on (score, label) pairs. A tiny ridge keeps the fit finite
    * when the data is separable.
    */
  def fit(scores: IndexedSeq[Double], labels: IndexedSeq[Boolean], ridge: Double = 1e-6): PlattModel = {
    require(scores.length == labels.length, "scores/labels length mismatch")
    require(scores.nonEmpty, "cannot calibrate on no data")
    val objective = new LBFGS.Objective {
      override def valueAndGradient(x: Array[Double]): (Double, Array[Double]) = {
        val a = x(0); val b = x(1)
        var loss = ridge * (a * a + b * b)
        var ga = 2 * ridge * a; var gb = 2 * ridge * b
        var i = 0
        while (i < scores.length) {
          val z = a * scores(i) + b
          val y = if (labels(i)) 1.0 else 0.0
          loss += (if (z > 0) z + math.log1p(math.exp(-z)) else math.log1p(math.exp(z))) - y * z
          val p = if (z >= 0) 1.0 / (1.0 + math.exp(-z)) else { val e = math.exp(z); e / (1.0 + e) }
          ga += (p - y) * scores(i)
          gb += (p - y)
          i += 1
        }
        (loss, Array(ga, gb))
      }
    }
    val res = LBFGS.minimize(objective, Array(1.0, 0.0), maxIters = 200, gradTol = 1e-7)
    PlattModel(res.x(0), res.x(1))
  }

  /** Raw (uncalibrated) mapping of a cosine/dot score in [−1, 1] to a
    * pseudo-probability — what a system without labels can do, and exactly
    * the miscalibration ENS is sensitive to (Table 4 top row).
    */
  def rawProbability(score: Double): Double = math.min(1.0, math.max(0.0, (score + 1.0) / 2.0))
}
