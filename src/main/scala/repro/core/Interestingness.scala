package repro.core

/** Interestingness functions h over the vector of aggregated group values
  * (paper §3 Step 5, Eq. 1, Appendix A).
  *
  * Each function also exposes its gradient ∂h/∂y_s — the ingredient of the
  * delta-method confidence interval used by early-stop (paper Theorem 2).
  * Degenerate inputs (fewer than 2 groups, zero dispersion) score 0:
  * an aggregate whose values cannot deviate is uninteresting by definition.
  *
  * Skewness/kurtosis are the standard central-moment forms
  * `m3 / m2^{3/2}` and `m4 / m2² − 3`; the appendix writes the same
  * quantities via the unbiased variance (its `[Ĥ]^{2/3}` exponent is a typo
  * for `^{-3/2}`). We take |skewness| as the score so that left- and
  * right-deviation are equally interesting for ranking.
  */
sealed trait Interestingness {
  def name: String
  def score(values: Array[Double]): Double
  def gradient(values: Array[Double]): Array[Double]
}

object Interestingness {
  private def mean(y: Array[Double]): Double = y.sum / y.length
  private def centralMoment(y: Array[Double], m: Double, p: Int): Double =
    y.map(v => math.pow(v - m, p)).sum / y.length

  /** Unbiased variance (paper Eq. 1). */
  case object Variance extends Interestingness {
    val name = "variance"
    def score(y: Array[Double]): Double = {
      val g = y.length
      if (g < 2) 0.0
      else { val m = mean(y); y.map(v => (v - m) * (v - m)).sum / (g - 1) }
    }
    def gradient(y: Array[Double]): Array[Double] = {
      val g = y.length
      if (g < 2) Array.fill(g)(0.0)
      else { val m = mean(y); y.map(v => 2.0 / (g - 1) * (v - m)) }
    }
  }

  /** |sample skewness| = |m3| / m2^{3/2}. */
  case object Skewness extends Interestingness {
    val name = "skewness"
    def score(y: Array[Double]): Double = {
      val g = y.length
      if (g < 2) return 0.0
      val m = mean(y); val m2 = centralMoment(y, m, 2)
      if (m2 <= 1e-12) 0.0 else math.abs(centralMoment(y, m, 3)) / math.pow(m2, 1.5)
    }
    def gradient(y: Array[Double]): Array[Double] = {
      val g = y.length
      if (g < 2) return Array.fill(g)(0.0)
      val m = mean(y); val m2 = centralMoment(y, m, 2); val m3 = centralMoment(y, m, 3)
      if (m2 <= 1e-12) return Array.fill(g)(0.0)
      val sign = if (m3 >= 0) 1.0 else -1.0
      y.map { v =>
        val dM3 = 3.0 / g * ((v - m) * (v - m) - m2)
        val dM2 = 2.0 / g * (v - m)
        sign * (dM3 / math.pow(m2, 1.5) - 1.5 * m3 * dM2 / math.pow(m2, 2.5))
      }
    }
  }

  /** Excess kurtosis = m4 / m2² − 3. */
  case object Kurtosis extends Interestingness {
    val name = "kurtosis"
    def score(y: Array[Double]): Double = {
      val g = y.length
      if (g < 2) return 0.0
      val m = mean(y); val m2 = centralMoment(y, m, 2)
      if (m2 <= 1e-12) 0.0 else centralMoment(y, m, 4) / (m2 * m2) - 3.0
    }
    def gradient(y: Array[Double]): Array[Double] = {
      val g = y.length
      if (g < 2) return Array.fill(g)(0.0)
      val m = mean(y); val m2 = centralMoment(y, m, 2)
      val m3 = centralMoment(y, m, 3); val m4 = centralMoment(y, m, 4)
      if (m2 <= 1e-12) return Array.fill(g)(0.0)
      y.map { v =>
        val dM4 = 4.0 / g * (math.pow(v - m, 3) - m3)
        val dM2 = 2.0 / g * (v - m)
        dM4 / (m2 * m2) - 2.0 * m4 / math.pow(m2, 3) * dM2
      }
    }
  }

  val all: Seq[Interestingness] = Seq(Variance, Skewness, Kurtosis)
  def byName(n: String): Interestingness = all.find(_.name == n).getOrElse(
    throw new IllegalArgumentException(s"unknown interestingness function: $n"))
}
