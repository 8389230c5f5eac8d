package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.SeriesGen.presets

class SeriesGenSpec extends AnyFunSuite {

  for (name <- presets.all) {
    val spec = presets.byName(name, 500)

    test(s"$name: series are deterministic in (spec, id)") {
      (0L until 20L).foreach { id =>
        assert(SeriesGen.series(spec, id).sameElements(SeriesGen.series(spec, id)))
      }
    }

    test(s"$name: series are z-normalized at the declared length") {
      (0L until 10L).foreach { id =>
        val s = SeriesGen.series(spec, id)
        assert(s.length == spec.length)
        val mean = s.sum / s.length
        assert(math.abs(mean) < 1e-9)
      }
    }

    test(s"$name: queries are deterministic and normalized") {
      (0 until 5).foreach { q =>
        val a = SeriesGen.query(spec, q)
        assert(a.sameElements(SeriesGen.query(spec, q)))
        assert(a.length == spec.length)
      }
    }
  }

  test("cluster blocks tile [0, nClustered) exactly") {
    val spec = presets.seismic(1000)
    assert(spec.clusterSizes.sum == spec.nClustered)
    assert(spec.clusterStarts.head == 0)
    // clusterOf is consistent with the block boundaries
    (0L until spec.n.toLong).foreach { id =>
      val c = spec.clusterOf(id)
      if (id < spec.nClustered) {
        assert(c >= 0 && c < spec.nClusters)
        assert(spec.clusterStarts(c) <= id)
        assert(id < spec.clusterStarts(c) + spec.clusterSizes(c))
      } else assert(c == -1)
    }
  }

  test("cluster members are near their center; unclustered walks are not") {
    val spec = presets.astro(600)
    val tight = spec.clusterSizes.length - 1 // last cluster has the smallest sigma
    val c = SeriesGen.center(spec, tight)
    val member = SeriesGen.series(spec, spec.clusterStarts(tight).toLong)
    val walk = SeriesGen.series(spec, (spec.n - 1).toLong)
    assert(Distances.ed(member, c) < Distances.ed(walk, c))
  }

  test("cluster sigma descends with cluster size (big clusters are loose)") {
    val spec = presets.seismic(1000)
    assert(SeriesGen.clusterSigma(spec, 0) > SeriesGen.clusterSigma(spec, spec.nClusters - 1))
    assert(spec.clusterSizes.head >= spec.clusterSizes.last)
  }

  test("different ids give different series") {
    val spec = presets.random(100)
    val a = SeriesGen.series(spec, 0)
    val b = SeriesGen.series(spec, 1)
    assert(Distances.ed(a, b) > 0.1)
  }

  test("training queries differ from evaluation queries") {
    val spec = presets.seismic(300)
    val ev = SeriesGen.queries(spec, 3)
    val tr = SeriesGen.trainingQueries(spec, 3)
    assert(Distances.ed(ev(0), tr(0)) > 1e-6)
  }

  test("easyFrac=1 queries sit closer to the collection than easyFrac=0") {
    val spec = presets.seismic(400)
    def minDist(q: Array[Double]): Double =
      (0L until spec.n.toLong).map(id => Distances.ed(q, SeriesGen.series(spec, id))).min
    val easy = (0 until 5).map(i => minDist(SeriesGen.query(spec, i, easyFrac = 1.0))).sum
    val hard = (0 until 5).map(i => minDist(SeriesGen.query(spec, i, easyFrac = 0.0))).sum
    assert(easy < hard)
  }

  test("byName rejects unknown datasets") {
    intercept[IllegalArgumentException](presets.byName("nope", 10))
  }
}
