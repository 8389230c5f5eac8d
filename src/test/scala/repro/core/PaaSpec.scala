package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PaaSpec extends AnyFunSuite {

  private def brute(values: Array[Double], w: Int): Array[Double] = {
    val sizes = Paa.segmentSizes(values.length, w)
    val out = new Array[Double](w)
    var p = 0
    sizes.indices.foreach { i =>
      out(i) = values.slice(p, p + sizes(i)).sum / sizes(i)
      p += sizes(i)
    }
    out
  }

  for (l <- Seq(8, 16, 64, 96, 100, 128, 200, 256); w <- Seq(4, 8, 16) if l >= w) {
    test(s"segment sizes tile the series exactly (L=$l, w=$w)") {
      val sizes = Paa.segmentSizes(l, w)
      assert(sizes.length == w)
      assert(sizes.sum == l)
      assert(sizes.max - sizes.min <= 1)
    }

    test(s"PAA equals per-segment means (L=$l, w=$w)") {
      val rng = new Rng.Stream(Rng.key(5, l * 31 + w))
      val v = Array.fill(l)(rng.nextGaussian())
      val got = Paa.of(v, w)
      val exp = brute(v, w)
      got.indices.foreach(i => assert(math.abs(got(i) - exp(i)) < 1e-12))
    }
  }

  test("PAA of a constant series is constant") {
    val v = Array.fill(64)(3.25)
    assert(Paa.of(v, 8).forall(x => math.abs(x - 3.25) < 1e-12))
  }

  test("PAA with w = L is the identity") {
    val rng = new Rng.Stream(17)
    val v = Array.fill(16)(rng.nextGaussian())
    assert(Paa.of(v, 16).zip(v).forall { case (a, b) => math.abs(a - b) < 1e-12 })
  }

  test("rejects w > L") {
    intercept[IllegalArgumentException](Paa.segmentSizes(4, 8))
  }
}
