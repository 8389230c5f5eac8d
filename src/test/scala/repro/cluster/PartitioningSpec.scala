package repro.cluster

import org.scalatest.funsuite.AnyFunSuite
import repro.core.SeriesGen.presets

class PartitioningSpec extends AnyFunSuite {

  private def loads(p: Partitioner, n: Long): Map[Int, Long] =
    (0L until n).groupBy(p.chunkOf).view.mapValues(_.size.toLong).toMap

  for (nChunks <- Seq(2, 4, 8); n <- Seq(100L, 1000L)) {
    test(s"EQUALLY-SPLIT covers all chunks near-evenly (chunks=$nChunks, n=$n)") {
      val p = Partitioning.EquallySplit(n, nChunks)
      val l = loads(p, n)
      assert(l.keySet == (0 until nChunks).toSet)
      assert(l.values.max - l.values.min <= 1)
    }

    test(s"EQUALLY-SPLIT chunks are contiguous id ranges (chunks=$nChunks, n=$n)") {
      val p = Partitioning.EquallySplit(n, nChunks)
      var last = 0
      (0L until n).foreach { id =>
        val c = p.chunkOf(id)
        assert(c >= last, "chunk ids must be non-decreasing in id order")
        last = c
      }
    }

    test(s"RandomShuffle is balanced within 20% and deterministic (chunks=$nChunks, n=$n)") {
      val p = Partitioning.RandomShuffle(nChunks)
      val l = loads(p, n)
      assert(l.keySet == (0 until nChunks).toSet)
      val avg = n.toDouble / nChunks
      l.values.foreach(v => assert(math.abs(v - avg) < avg * 0.5 + 8))
      (0L until 50L).foreach(id => assert(p.chunkOf(id) == Partitioning.RandomShuffle(nChunks).chunkOf(id)))
    }
  }

  test("RandomShuffle breaks id-contiguity") {
    val p = Partitioning.RandomShuffle(4)
    val firstHundred = (0L until 100L).map(p.chunkOf).toSet
    assert(firstHundred.size > 1)
  }

  for (nChunks <- Seq(2, 4)) {
    test(s"DENSITY-AWARE covers every id, balanced within tolerance (chunks=$nChunks)") {
      val spec = presets.seismic(800)
      val p = Partitioning.densityAware(spec, nChunks, w = 8, lambda = 8)
      val l = loads(p, spec.n.toLong)
      assert(l.values.sum == spec.n)
      assert(l.keySet.subsetOf((0 until nChunks).toSet))
      val avg = spec.n.toDouble / nChunks
      l.values.foreach(v => assert(math.abs(v - avg) <= avg * 0.35 + 16, s"loads=$l"))
    }

    test(s"DENSITY-AWARE spreads each dense cluster across chunks (chunks=$nChunks)") {
      val spec = presets.astro(800) // 80% clustered: heavy buffers exist
      val p = Partitioning.densityAware(spec, nChunks, w = 8, lambda = 8)
      // the largest cluster's members must not all land on one chunk
      val big = spec.clusterSizes.indices.maxBy(spec.clusterSizes)
      val ids = (spec.clusterStarts(big).toLong until
                 (spec.clusterStarts(big) + spec.clusterSizes(big)).toLong)
      val perChunk = ids.groupBy(p.chunkOf).view.mapValues(_.size).toMap
      assert(perChunk.size > 1, s"cluster $big entirely on one chunk")
      assert(perChunk.values.max < ids.size, "no chunk may own the whole dense cluster")
    }
  }

  test("DENSITY-AWARE beats EQUALLY-SPLIT at spreading the densest cluster") {
    val spec = presets.astro(600)
    val nChunks = 4
    val da = Partitioning.densityAware(spec, nChunks, w = 8, lambda = 8)
    val eq = Partitioning.EquallySplit(spec.n.toLong, nChunks)
    val big = spec.clusterSizes.indices.maxBy(spec.clusterSizes)
    val ids = (spec.clusterStarts(big).toLong until
               (spec.clusterStarts(big) + spec.clusterSizes(big)).toLong)
    def maxShare(p: Partitioner): Double =
      ids.groupBy(p.chunkOf).values.map(_.size).max.toDouble / ids.size
    assert(maxShare(da) < maxShare(eq))
  }

  test("Table partitioner answers from its map and reports its name") {
    val t = Partitioning.Table("X", 2, Map(0L -> 0, 1L -> 1, 2L -> 0))
    assert(t.chunkOf(1L) == 1)
    assert(t.chunkOf(2L) == 0)
    assert(t.name == "X")
  }

  test("partitioner names are stable") {
    assert(Partitioning.EquallySplit(10, 2).name == "EQUALLY-SPLIT")
    assert(Partitioning.RandomShuffle(2).name == "EQUALLY-SPLIT-RS")
    val spec = presets.seismic(100)
    assert(Partitioning.densityAware(spec, 2, 8, 4).name == "DENSITY-AWARE")
  }
}
