package repro.model

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** The pure-Scala MLP regressor head. */
class MlpSpec extends AnyFunSuite {

  test("construction validates layer count") {
    intercept[IllegalArgumentException](new Mlp(Array(4), 1))
  }

  test("predictions are deterministic in the seed") {
    val a = new Mlp(Array(3, 8, 2), 42)
    val b = new Mlp(Array(3, 8, 2), 42)
    val x = Array(0.1, 0.5, 0.9)
    assert(a.predict(x).toSeq == b.predict(x).toSeq)
  }

  test("different seeds give different initializations") {
    val a = new Mlp(Array(3, 8, 2), 1)
    val b = new Mlp(Array(3, 8, 2), 2)
    assert(a.predict(Array(0.1, 0.5, 0.9)).toSeq != b.predict(Array(0.1, 0.5, 0.9)).toSeq)
  }

  test("output width matches the last layer") {
    val m = new Mlp(Array(5, 7, 3), 1)
    assert(m.predict(Array.fill(5)(0.3)).length == 3)
  }

  test("training reduces the loss on a linear target") {
    val rnd = new Random(7)
    val xs = Array.fill(512)(Array.fill(4)(rnd.nextDouble()))
    val ys = xs.map(x => Array(2 * x(0) - x(1) + 0.5, x(2) * 0.3))
    val m = new Mlp(Array(4, 16, 2), 3)
    val first = m.train(xs, ys, epochs = 1)
    val last = m.train(xs, ys, epochs = 30)
    assert(last < first / 5, s"loss $first -> $last")
  }

  test("training fits a mildly nonlinear target to low error") {
    val rnd = new Random(11)
    val xs = Array.fill(1024)(Array.fill(3)(rnd.nextDouble()))
    val ys = xs.map(x => Array(math.sin(x(0) * 2) + x(1) * x(2)))
    val m = new Mlp(Array(3, 32, 32, 1), 5)
    m.train(xs, ys, epochs = 60, lr = 3e-3)
    val mse = xs.zip(ys).map { case (x, y) =>
      val p = m.predict(x)(0) - y(0); p * p
    }.sum / xs.length
    assert(mse < 0.01, s"mse $mse")
  }

  test("training is deterministic end to end") {
    def fit(): Double = {
      val rnd = new Random(3)
      val xs = Array.fill(128)(Array.fill(3)(rnd.nextDouble()))
      val ys = xs.map(x => Array(x(0) + x(1)))
      val m = new Mlp(Array(3, 8, 1), 9)
      m.train(xs, ys, epochs = 5)
    }
    assert(fit() == fit())
  }

  test("train rejects empty or mismatched data") {
    val m = new Mlp(Array(2, 4, 1), 1)
    intercept[IllegalArgumentException](m.train(Array.empty, Array.empty, 1))
    intercept[IllegalArgumentException](
      m.train(Array(Array(1.0, 2.0)), Array.empty, 1))
  }

  test("RegModel maps standardized log outputs back to positive quantities") {
    val m = new Mlp(Array(2, 4, 2), 1)
    val rm = RegModel(m, Array(0.0, 0.0), Array(1.0, 1.0))
    val (lat, io) = rm.predictLatIo(Array(0.3, 0.7))
    assert(lat > 0 && io >= 0)
  }

  test("RegModel un-scales with the stored mean and std") {
    val m = new Mlp(Array(1, 2, 2), 1)
    val raw = m.predict(Array(0.5))
    val rm = RegModel(m, Array(1.0, 2.0), Array(0.5, 0.25))
    val (lat, io) = rm.predictLatIo(Array(0.5))
    assert(math.abs(lat - math.exp(raw(0) * 0.5 + 1.0)) < 1e-9)
    assert(math.abs(io - math.exp(raw(1) * 0.25 + 2.0)) < 1e-9)
  }
}
