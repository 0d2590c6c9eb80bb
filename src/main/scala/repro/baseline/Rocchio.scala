package repro.baseline

import repro.core.{Example, Linalg}

/** Rocchio's relevance-feedback algorithm (paper §5.4, Eq. 6):
  *
  *   q = α q₀ + (β/|D_r|) Σ_{d∈D_r} d − (γ/|D_n|) Σ_{d∈D_n} d
  *
  * with the paper's tuned weights α=1, β=.5, γ=.25. Implicitly a form of
  * CLIP alignment — the α q₀ term anchors the query to the original text
  * embedding, which is why it beats few-shot CLIP in Table 3.
  */
final case class Rocchio(alpha: Double = 1.0, beta: Double = 0.5, gamma: Double = 0.25) {
  require(alpha >= 0 && beta >= 0 && gamma >= 0, "weights must be non-negative")

  /** The updated (unit-norm) query given feedback so far. */
  def update(q0: Array[Float], examples: IndexedSeq[Example]): Array[Float] = {
    val q = q0.map(v => (alpha * v).toFloat)
    val pos = examples.collect { case e if e.positive => e.vec }
    val neg = examples.collect { case e if !e.positive => e.vec }
    if (pos.nonEmpty) Linalg.axpy(beta, Linalg.mean(pos), q)
    if (neg.nonEmpty) Linalg.axpy(-gamma, Linalg.mean(neg), q)
    Linalg.normalize(q)
  }
}
