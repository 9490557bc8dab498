package repro.model

import org.scalatest.funsuite.AnyFunSuite

/** The Table 3 metric definitions. */
class MetricsSpec extends AnyFunSuite {

  test("wmape of a perfect prediction is zero") {
    assert(Metrics.wmape(Array(1.0, 2.0, 3.0), Array(1.0, 2.0, 3.0)) == 0.0)
  }

  test("wmape weights errors by magnitude") {
    // |10-20| / (10+90) = 0.1 even though the relative error on the first
    // element is 100%.
    assert(math.abs(Metrics.wmape(Array(10.0, 90.0), Array(20.0, 90.0)) - 0.1) < 1e-12)
  }

  test("wmape rejects mismatched inputs") {
    intercept[IllegalArgumentException](Metrics.wmape(Array(1.0), Array(1.0, 2.0)))
    intercept[IllegalArgumentException](Metrics.wmape(Array.empty, Array.empty))
  }

  test("relative-error percentiles are order statistics") {
    val y = Array(10.0, 10.0, 10.0, 10.0)
    val p = Array(11.0, 12.0, 13.0, 20.0) // rel errs 0.1, 0.2, 0.3, 1.0
    assert(math.abs(Metrics.relErrPercentile(y, p, 0.5) - 0.2) < 1e-12)
    assert(math.abs(Metrics.relErrPercentile(y, p, 0.9) - 1.0) < 1e-12)
  }

  test("pearson of identical series is 1") {
    val y = Array(1.0, 2.0, 5.0, 9.0)
    assert(math.abs(Metrics.pearson(y, y) - 1.0) < 1e-12)
  }

  test("pearson of an anti-correlated series is -1") {
    val y = Array(1.0, 2.0, 3.0)
    assert(math.abs(Metrics.pearson(y, y.map(-_)) + 1.0) < 1e-12)
  }

  test("pearson of a constant series is 0 by convention") {
    assert(Metrics.pearson(Array(1.0, 1.0, 1.0), Array(1.0, 2.0, 3.0)) == 0.0)
  }

  test("pearson requires at least two samples") {
    intercept[IllegalArgumentException](Metrics.pearson(Array(1.0), Array(1.0)))
  }

  test("report bundles all four statistics") {
    val r = Metrics.report(Array(10.0, 20.0), Array(11.0, 19.0))
    assert(r.wmape > 0 && r.p50 > 0 && r.p90 >= r.p50 && r.corr > 0.9)
  }

  test("wmape of an all-zero target is zero by convention") {
    assert(Metrics.wmape(Array(0.0, 0.0), Array(0.0, 0.0)) == 0.0)
  }
}
