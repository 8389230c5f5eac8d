package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DistancesSpec extends AnyFunSuite {

  private def rand(seed: Long, l: Int): Array[Double] = {
    val st = new Rng.Stream(seed)
    Array.fill(l)(st.nextGaussian())
  }

  test("ed matches the textbook formula") {
    val a = Array(0.0, 3.0); val b = Array(4.0, 0.0)
    assert(math.abs(Distances.ed(a, b) - 5.0) < 1e-12)
  }

  test("ed of identical series is zero; ed is symmetric") {
    val a = rand(4, 100)
    assert(Distances.ed(a, a) == 0.0)
    val b = rand(5, 100)
    assert(math.abs(Distances.ed(a, b) - Distances.ed(b, a)) < 1e-12)
  }

  for (trial <- 0 until 15) {
    test(s"early-abandon ED equals plain ED when the bound is loose (trial=$trial)") {
      val a = rand(trial * 17L + 1, 64); val b = rand(trial * 19L + 2, 64)
      val c = new Cost
      val d = Distances.edEarlyAbandon(a, b, Double.PositiveInfinity, c)
      assert(math.abs(d - Distances.ed(a, b)) < 1e-9)
      assert(c.ops == 64)
    }

    test(s"early-abandon ED abandons under a tight bound and charges fewer ops (trial=$trial)") {
      val a = rand(trial * 23L + 3, 256); val b = rand(trial * 29L + 4, 256)
      val real = Distances.ed(a, b)
      val c = new Cost
      val d = Distances.edEarlyAbandon(a, b, real / 4, c)
      assert(d.isPosInfinity)
      assert(c.ops < 256)
    }
  }

  test("envelope brackets the series and widens with the radius") {
    val q = rand(7, 100)
    var prevWidth = -1.0
    for (r <- Seq(0, 2, 5, 10)) {
      val (up, lo) = Distances.envelope(q, r)
      q.indices.foreach { i => assert(lo(i) <= q(i) && q(i) <= up(i)) }
      val width = q.indices.map(i => up(i) - lo(i)).sum
      assert(width >= prevWidth)
      prevWidth = width
    }
  }

  test("envelope with r = 0 is the series itself") {
    val q = rand(8, 50)
    val (up, lo) = Distances.envelope(q, 0)
    q.indices.foreach { i => assert(up(i) == q(i) && lo(i) == q(i)) }
  }

  for (trial <- 0 until 10; r <- Seq(2, 5)) {
    test(s"LB_Keogh is a lower bound of DTW (trial=$trial, r=$r)") {
      val q = rand(trial * 31L + 5, 64); val s = rand(trial * 37L + 6, 64)
      val (up, lo) = Distances.envelope(q, r)
      val lb  = Distances.lbKeogh(s, up, lo, Double.PositiveInfinity, new Cost)
      val dtw = Distances.dtwBand(q, s, r, Double.PositiveInfinity, new Cost)
      assert(lb <= dtw + 1e-9)
    }
  }

  for (trial <- 0 until 10) {
    test(s"DTW with radius 0 equals ED; wider bands never increase DTW (trial=$trial)") {
      val a = rand(trial * 41L + 7, 48); val b = rand(trial * 43L + 8, 48)
      val d0 = Distances.dtwBand(a, b, 0, Double.PositiveInfinity, new Cost)
      assert(math.abs(d0 - Distances.ed(a, b)) < 1e-9)
      var prev = d0
      for (r <- Seq(1, 2, 4, 8, 47)) {
        val d = Distances.dtwBand(a, b, r, Double.PositiveInfinity, new Cost)
        assert(d <= prev + 1e-9)
        prev = d
      }
    }
  }

  test("DTW early abandons under a tight bound") {
    val a = rand(9, 128); val b = rand(10, 128).map(_ + 50.0)
    val c = new Cost
    assert(Distances.dtwBand(a, b, 5, 0.001, c).isPosInfinity)
    assert(c.ops < 128L * 11) // stopped before filling the whole band
  }

  test("DTW of identical series is zero") {
    val a = rand(11, 64)
    assert(Distances.dtwBand(a, a, 3, Double.PositiveInfinity, new Cost) == 0.0)
  }

  test("DTW is symmetric with a symmetric band") {
    val a = rand(12, 40); val b = rand(13, 40)
    val d1 = Distances.dtwBand(a, b, 4, Double.PositiveInfinity, new Cost)
    val d2 = Distances.dtwBand(b, a, 4, Double.PositiveInfinity, new Cost)
    assert(math.abs(d1 - d2) < 1e-9)
  }

  test("zNormalize yields zero mean, unit variance") {
    val v = rand(14, 200).map(_ * 3 + 7)
    val z = Distances.zNormalize(v)
    val mean = z.sum / z.length
    val varr = z.map(x => (x - mean) * (x - mean)).sum / z.length
    assert(math.abs(mean) < 1e-9)
    assert(math.abs(varr - 1.0) < 1e-9)
  }

  test("zNormalize maps constant series to zeros") {
    assert(Distances.zNormalize(Array.fill(10)(4.2)).forall(_ == 0.0))
  }
}
