package repro.metrics

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.gen.GraphGen

class SkewnessSpec extends AnyFunSuite {

  test("pearson1 on a hand-computed sequence") {
    // degrees 1,1,1,5: mean=2, mode=1, var=(1+1+1+9)/4=3, σ=√3
    val d = Array(1, 1, 1, 5)
    assert(math.abs(Skewness.pearson1(d) - (2.0 - 1.0) / math.sqrt(3.0)) < 1e-12)
  }

  test("pearson2 on a hand-computed sequence") {
    // degrees 1,1,1,5: median=1, 3(2-1)/√3
    val d = Array(1, 1, 1, 5)
    assert(math.abs(Skewness.pearson2(d) - 3.0 / math.sqrt(3.0)) < 1e-12)
  }

  test("pearson measures are zero for constant degrees") {
    val d = Array.fill(10)(4)
    assert(Skewness.pearson1(d) == 0.0)
    assert(Skewness.pearson2(d) == 0.0)
  }

  test("pearson2 median handles even/odd lengths") {
    assert(math.abs(Skewness.pearson2(Array(1, 2, 3))) < 1e-9)   // symmetric
    assert(Skewness.pearson2(Array(1, 1, 2, 8)) > 0)             // right skew
  }

  test("rho3 = |E| - (3|V| - 6)") {
    val r = Skewness.fromDegrees(Array(1, 1, 2, 2), numEdges = 100)
    assert(r.rho3 == 100 - (3 * 4 - 6))
  }

  test("regression rho on an exact power law recovers the exponent") {
    // Construct degrees so that count(d) = round(1000·d^-2).
    val degrees = (1 to 30).flatMap { d =>
      val cnt = math.max(1, math.round(1000.0 * math.pow(d, -2.0)).toInt)
      Seq.fill(cnt)(d)
    }.toArray
    val rho = Skewness.regressionRho(degrees)
    assert(math.abs(rho - 2.0) < 0.25, s"fitted rho=$rho")
  }

  test("more skewed generator yields larger Pearson second skew") {
    // pearson2 (median-based) is robust where pearson1's mode is noisy.
    def p2(a: Double) = {
      val stats = TestGraphs.localStats(GraphGen.rmat(2000, 30000, 9, a, (1 - a) / 3, (1 - a) / 3))
      import scala.jdk.CollectionConverters._
      Skewness.pearson2(stats.degrees.values().asScala.map(_.toInt).toArray)
    }
    assert(p2(0.75) > p2(0.25))
  }

  test("degenerate inputs do not crash") {
    assert(Skewness.regressionRho(Array(3)) == 0.0)
    intercept[IllegalArgumentException] { Skewness.fromDegrees(Array.empty, 0) }
  }
}
