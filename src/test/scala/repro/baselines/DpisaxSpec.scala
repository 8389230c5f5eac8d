package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.SeriesGen
import repro.core.SeriesGen.presets
import repro.core.Distances

class DpisaxSpec extends AnyFunSuite {

  for (nChunks <- Seq(2, 4, 8)) {
    test(s"DPiSAX assigns every series to a valid chunk (chunks=$nChunks)") {
      val spec = presets.seismic(500)
      val p = Dpisax.partition(spec, nChunks, w = 8)
      (0L until spec.n.toLong).foreach { id =>
        val c = p.chunkOf(id)
        assert(c >= 0 && c < nChunks)
      }
      assert(p.nChunks == nChunks)
      assert(p.name == "DPISAX")
    }
  }

  test("DPiSAX partitioning is deterministic") {
    val spec = presets.seismic(300)
    val a = Dpisax.partition(spec, 4, w = 8)
    val b = Dpisax.partition(spec, 4, w = 8)
    (0L until spec.n.toLong).foreach(id => assert(a.chunkOf(id) == b.chunkOf(id)))
  }

  test("DPiSAX is roughly sample-balanced") {
    val spec = presets.seismic(1000)
    val p = Dpisax.partition(spec, 4, w = 8)
    val loads = (0L until spec.n.toLong).groupBy(p.chunkOf).view.mapValues(_.size).toMap
    assert(loads.values.sum == spec.n)
    // iSAX-space splits cannot be perfectly even; just forbid pathologies
    assert(loads.values.max < spec.n * 0.8)
  }

  test("DPiSAX co-locates similar series (the behaviour Odyssey avoids)") {
    // members of the densest cluster share an iSAX region -> mostly the
    // same chunk; DENSITY-AWARE deliberately spreads them instead
    val spec = presets.astro(600)
    val p = Dpisax.partition(spec, 4, w = 8)
    val big = spec.clusterSizes.indices.maxBy(spec.clusterSizes)
    val ids = (spec.clusterStarts(big).toLong until
               (spec.clusterStarts(big) + spec.clusterSizes(big)).toLong)
    val shares = ids.groupBy(p.chunkOf).view.mapValues(_.size).toMap
    val maxShare = shares.values.max.toDouble / ids.size
    val da = repro.cluster.Partitioning.densityAware(spec, 4, w = 8, lambda = 8)
    val daShare = ids.groupBy(da.chunkOf).values.map(_.size).max.toDouble / ids.size
    assert(maxShare > daShare, s"dpisax=$maxShare density-aware=$daShare")
  }

  test("nearby series land in the same chunk more often than far series") {
    val spec = presets.astro(400)
    val p = Dpisax.partition(spec, 4, w = 8)
    // pairs within the tightest cluster (the last one) vs random cross pairs
    val tight = spec.clusterSizes.length - 1
    val start = spec.clusterStarts(tight).toLong
    val span = math.min(spec.clusterSizes(tight) - 1, 30)
    val within = (0 until span).count { i =>
      p.chunkOf(start + i) == p.chunkOf(start + i + 1)
    }
    val across = (0 until span).count { i =>
      p.chunkOf(i.toLong) == p.chunkOf((spec.n - 1 - i).toLong)
    }
    assert(within >= across)
  }

  test("chunk regions reflect iSAX similarity: same-word series share a chunk") {
    val spec = presets.seismic(300)
    val p = Dpisax.partition(spec, 4, w = 8)
    val byWord = (0L until spec.n.toLong).groupBy { id =>
      repro.core.ISax.rootKey(repro.core.ISax.word(
        repro.core.Paa.of(SeriesGen.series(spec, id), 8)))
    }
    // within any fully refined first-bit region that maps to one bucket,
    // a strong majority should share the chunk
    val agree = byWord.values.filter(_.size >= 3).count { ids =>
      ids.map(p.chunkOf).groupBy(identity).values.map(_.size).max >= ids.size / 2
    }
    assert(agree >= byWord.values.count(_.size >= 3) / 2)
  }
}
