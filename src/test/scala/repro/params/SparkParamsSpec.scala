package repro.params

import org.scalatest.funsuite.AnyFunSuite
import repro.TestProp.forAllSeeds

/** The 19-parameter space of Tables 1/6: domains, clamping, unit mapping. */
class SparkParamsSpec extends AnyFunSuite {
  import SparkParams._

  private val allDefs = thetaCDefs ++ thetaPDefs ++ thetaSDefs

  test("the space has 19 parameters: 8 θc + 9 θp + 2 θs") {
    assert(dC == 8 && dP == 9 && dS == 2 && dAll == 19)
  }

  test("every parameter has a non-degenerate domain") {
    allDefs.foreach(d => assert(d.hi > d.lo, d.name))
  }

  test("parameter names are unique Spark conf keys") {
    assert(allDefs.map(_.name).distinct.size == allDefs.size)
  }

  allDefs.foreach { d =>
    test(s"${d.name}: clamp keeps values inside [${d.lo}, ${d.hi}]") {
      forAllSeeds() { rnd =>
        val v = rnd.nextGaussian() * 1e4
        val c = d.clamp(v)
        assert(c >= d.lo && c <= d.hi)
      }
    }
  }

  allDefs.foreach { d =>
    test(s"${d.name}: fromUnit(toUnit(v)) is stable on domain values") {
      val mid = d.clamp((d.lo + d.hi) / 2)
      assert(math.abs(d.fromUnit(d.toUnit(mid)) - mid) <= (if (d.integral) 0.5 else 1e-9))
    }
  }

  test("fromUnit(0) and fromUnit(1) hit the domain bounds") {
    allDefs.foreach { d =>
      assert(d.fromUnit(0.0) == d.clamp(d.lo))
      assert(d.fromUnit(1.0) == d.clamp(d.hi))
    }
  }

  test("integral parameters decode to whole numbers") {
    allDefs.filter(_.integral).foreach { d =>
      val v = d.fromUnit(0.377)
      assert(v == math.round(v).toDouble, d.name)
    }
  }

  test("default θc is inside its domain") {
    val v = ThetaC.default.toVector
    thetaCDefs.zip(v).foreach { case (d, x) => assert(d.clamp(x) == x, d.name) }
  }

  test("default θp is inside its domain") {
    val v = ThetaP.default.toVector
    thetaPDefs.zip(v).foreach { case (d, x) => assert(d.clamp(x) == x, d.name) }
  }

  test("default θs is inside its domain") {
    val v = ThetaS.default.toVector
    thetaSDefs.zip(v).foreach { case (d, x) => assert(d.clamp(x) == x, d.name) }
  }

  test("ThetaC derived quantities: total cores, memory, task memory") {
    val c = ThetaC.default
    assert(c.totalCores == c.execCores * c.execInstances)
    assert(c.totalMemGb == c.execMemoryGb * c.execInstances)
    assert(c.taskMemoryMb > 0)
  }

  test("ThetaC.fromVector round-trips toVector") {
    assert(ThetaC.fromVector(ThetaC.default.toVector) == ThetaC.default)
  }

  test("ThetaP.fromVector round-trips toVector") {
    assert(ThetaP.fromVector(ThetaP.default.toVector) == ThetaP.default)
  }

  test("ThetaS.fromVector round-trips toVector") {
    assert(ThetaS.fromVector(ThetaS.default.toVector) == ThetaS.default)
  }

  test("Configuration.fromUnit splits coordinates into the three blocks") {
    forAllSeeds() { rnd =>
      val u = Vector.fill(dAll)(rnd.nextDouble())
      val conf = Configuration.fromUnit(u)
      assert(conf.toVector.size == dAll)
      assert(conf.c == ThetaC.fromUnit(u.slice(0, dC)))
      assert(conf.p == ThetaP.fromUnit(u.slice(dC, dC + dP)))
      assert(conf.s == ThetaS.fromUnit(u.slice(dC + dP, dAll)))
    }
  }

  test("Configuration.fromUnit rejects wrong widths") {
    intercept[IllegalArgumentException](Configuration.fromUnit(Vector(0.5)))
  }

  test("ThetaC.fromVector rejects wrong widths") {
    intercept[IllegalArgumentException](ThetaC.fromVector(Vector(1.0)))
  }
}
