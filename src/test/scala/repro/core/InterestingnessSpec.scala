package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}

/** Interestingness functions: exact values on known vectors, degenerate-input
  * behavior, and gradients validated against numerical differentiation
  * (ScalaCheck properties run through `SCTest.check` — the scalatestplus
  * bridge is not among the offline dependencies).
  */
class InterestingnessSpec extends AnyFunSuite {
  import Interestingness._

  private def checkProp(p: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(200), p)
    assert(res.passed, res.status.toString)
  }

  private val vecGen: Gen[Array[Double]] =
    Gen.chooseNum(3, 12).flatMap { n =>
      Gen.listOfN(n, Gen.chooseNum(-50.0, 50.0)).map(_.toArray)
    }.suchThat { y =>
      val m = y.sum / y.length
      y.map(v => (v - m) * (v - m)).sum / y.length > 1e-2 // non-degenerate
    }

  private def numericGrad(h: Interestingness, y: Array[Double]): Array[Double] = {
    val eps = 1e-5
    y.indices.map { i =>
      val up = y.clone; up(i) += eps
      val dn = y.clone; dn(i) -= eps
      (h.score(up) - h.score(dn)) / (2 * eps)
    }.toArray
  }

  test("variance matches the unbiased formula") {
    assert(Variance.score(Array(2, 4, 4, 4, 5, 5, 7, 9)) === 32.0 / 7)
    assert(Variance.score(Array(1, 1, 1)) === 0.0)
  }

  test("variance of fewer than two groups is zero (degenerate)") {
    assert(Variance.score(Array(42.0)) === 0.0)
    assert(Variance.score(Array.empty[Double]) === 0.0)
  }

  test("skewness is zero for symmetric data, positive for a right outlier") {
    assert(math.abs(Skewness.score(Array(1, 2, 3, 4, 5))) < 1e-12)
    assert(Skewness.score(Array(1, 1, 1, 1, 100)) > 1.0)
  }

  test("kurtosis: excess kurtosis of two-point symmetric mass is -2") {
    assert(math.abs(Kurtosis.score(Array(-1, 1, -1, 1)) - (-2.0)) < 1e-12)
  }

  test("kurtosis detects heavy tails") {
    assert(Kurtosis.score(Array(0, 0, 0, 0, 0, 0, 0, 0, 0, 50)) >
           Kurtosis.score(Array(0, 1, 2, 3, 4, 5, 6, 7, 8, 9)))
  }

  test("constant vectors score zero for all functions") {
    val y = Array(7.0, 7.0, 7.0, 7.0)
    all.foreach(h => assert(h.score(y) === 0.0, h.name))
  }

  test("byName resolves every function and rejects unknowns") {
    all.foreach(h => assert(byName(h.name) === h))
    assertThrows[IllegalArgumentException](byName("nope"))
  }

  for (h <- all) {
    test(s"${h.name} gradient matches numerical differentiation (property)") {
      checkProp(Prop.forAll(vecGen) { y =>
        // |skewness| has a kink at m3 = 0 — numerical differentiation is
        // meaningless in its neighborhood, so skip near-symmetric vectors.
        if (h == Skewness && Skewness.score(y) < 0.05) true
        else {
          val g = h.gradient(y)
          val n = numericGrad(h, y)
          g.zip(n).forall { case (a, b) =>
            val scale = math.max(1.0, math.max(math.abs(a), math.abs(b)))
            math.abs(a - b) / scale < 1e-3
          }
        }
      })
    }
  }

  test("variance is non-negative (property)") {
    checkProp(Prop.forAll(vecGen)(y => Variance.score(y) >= 0.0))
  }

  test("variance gradient is exactly 2/(G-1)(y_s - mean)") {
    val y = Array(1.0, 3.0, 8.0)
    val m = 4.0
    val g = Variance.gradient(y)
    y.indices.foreach(i => assert(math.abs(g(i) - 2.0 / 2 * (y(i) - m)) < 1e-12))
  }

  test("scores are translation-invariant") {
    val y = Array(1.0, 5.0, 9.0, 2.0)
    val shifted = y.map(_ + 100)
    assert(math.abs(Variance.score(y) - Variance.score(shifted)) < 1e-9)
    assert(math.abs(Kurtosis.score(y) - Kurtosis.score(shifted)) < 1e-9)
    assert(math.abs(Skewness.score(y) - Skewness.score(shifted)) < 1e-9)
  }
}
