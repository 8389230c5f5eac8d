package repro.cluster

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Rng

class PredictionSpec extends AnyFunSuite {

  test("OLS recovers an exact linear relation") {
    val xs = (1 to 50).map(_.toDouble)
    val ys = xs.map(x => 3.5 * x - 7)
    val m = Prediction.fitOls(xs, ys)
    assert(math.abs(m.slope - 3.5) < 1e-9)
    assert(math.abs(m.intercept + 7) < 1e-9)
    assert(m.r2 > 0.999999)
  }

  test("OLS on noisy data keeps a high r2 and a close slope") {
    val rng = new Rng.Stream(3)
    val xs = (1 to 200).map(_.toDouble)
    val ys = xs.map(x => 2 * x + 5 + rng.nextGaussian() * 3)
    val m = Prediction.fitOls(xs, ys)
    assert(math.abs(m.slope - 2) < 0.1)
    assert(m.r2 > 0.95)
  }

  test("predict applies slope and intercept") {
    val m = Prediction.LinearModel(2.0, 1.0, 1.0)
    assert(m.predict(10.0) == 21.0)
  }

  test("constant x degenerates to the mean with r2 = 0") {
    val m = Prediction.fitOls(Seq(5.0, 5.0, 5.0), Seq(1.0, 2.0, 3.0))
    assert(m.slope == 0.0)
    assert(math.abs(m.predict(5.0) - 2.0) < 1e-12)
    assert(m.r2 == 0.0)
  }

  test("uncorrelated data gives near-zero r2") {
    val rng = new Rng.Stream(9)
    val xs = (1 to 300).map(_ => rng.nextGaussian())
    val ys = (1 to 300).map(_ => rng.nextGaussian())
    assert(Prediction.fitOls(xs, ys).r2 < 0.05)
  }

  test("empty input is rejected") {
    intercept[IllegalArgumentException](Prediction.fitOls(Seq.empty, Seq.empty))
  }
}
