package repro.baselines

import scala.collection.mutable
import repro.cluster.Partitioning
import repro.core.{ISax, Paa, Rng}
import repro.core.SeriesGen.DatasetSpec

/** DPiSAX data partitioning (Yagoubi et al., TKDE 2020) — the competitor's
  * distribution strategy (§2.1, evaluated in Fig. 17d).
  *
  * DPiSAX samples the collection, computes iSAX words of the sample, and
  * splits the *iSAX space* into regions of approximately equal sample mass;
  * each node then stores (and locally indexes) one region's series. Because
  * regions are contiguous in iSAX space, similar series land on the same
  * node — precisely the density concentration Odyssey's DENSITY-AWARE
  * partitioning is designed to avoid.
  *
  * Implementation: start from one bucket per first-bit root word occupied
  * by the sample; repeatedly split the heaviest bucket by promoting the
  * cardinality of its least-refined segment until there are at least
  * `nChunks` buckets; then greedily bin-pack buckets (largest first) onto
  * the least-loaded chunk. Series in regions unseen in the sample follow
  * their nearest (longest-prefix) bucket.
  */
object Dpisax {

  /** A region of iSAX space: per-segment (symbol, bits) prefix + sample load. */
  private final case class Bucket(word: Array[Int], bits: Array[Int], var size: Int) {
    def matches(sax: Array[Int]): Boolean = {
      var i = 0
      while (i < word.length) {
        if (bits(i) > 0 && (sax(i) >>> (ISax.MaxBits - bits(i))) != word(i)) return false
        i += 1
      }
      true
    }
    def depth: Int = bits.sum
  }

  def partition(spec: DatasetSpec, nChunks: Int, w: Int,
                sampleFrac: Double = 0.05, seed: Long = 41): Partitioning.Table = {
    require(nChunks >= 1)
    val rng = new Rng.Stream(Rng.key(seed, spec.n.toLong))
    val sampleN = math.max(nChunks * 8, (spec.n * sampleFrac).toInt)
    val sample = Array.fill(sampleN)(rng.nextInt(spec.n).toLong)
    def saxOf(id: Long): Array[Int] =
      ISax.word(Paa.of(repro.core.SeriesGen.series(spec, id), w))

    // seed buckets: occupied first-bit words
    val sampleSax = sample.map(saxOf)
    val seedMap = mutable.HashMap.empty[Int, Bucket]
    sampleSax.foreach { sax =>
      val word = sax.map(_ >>> (ISax.MaxBits - 1))
      val key  = ISax.rootKey(sax)
      val b = seedMap.getOrElseUpdate(key, Bucket(word, Array.fill(w)(1), 0))
      b.size += 1
    }
    val buckets = mutable.ArrayBuffer.empty[Bucket] ++ seedMap.values

    // split heaviest bucket until we can fill every chunk
    var guard = 64 * nChunks
    while (buckets.length < nChunks && guard > 0) {
      guard -= 1
      val heavy = buckets.maxBy(_.size)
      val seg = heavy.bits.indices
        .filter(heavy.bits(_) < ISax.MaxBits)
        .sortBy(heavy.bits(_)).headOption.getOrElse(-1)
      if (seg < 0) guard = 0
      else {
        buckets -= heavy
        val nb = heavy.bits(seg) + 1
        val mk = (bit: Int) => {
          val w2 = heavy.word.clone(); val b2 = heavy.bits.clone()
          w2(seg) = heavy.word(seg) * 2 + bit; b2(seg) = nb
          Bucket(w2, b2, 0)
        }
        val c0 = mk(0); val c1 = mk(1)
        sampleSax.foreach { sax =>
          if (c0.matches(sax)) c0.size += 1 else if (c1.matches(sax)) c1.size += 1
        }
        buckets += c0 += c1
      }
    }

    // bin-pack buckets to chunks, largest first onto least loaded
    val load = new Array[Long](nChunks)
    val chunkOfBucket = mutable.HashMap.empty[Bucket, Int]
    buckets.sortBy(-_.size).foreach { b =>
      val c = load.indices.minBy(load)
      chunkOfBucket(b) = c
      load(c) += b.size
    }
    // deepest matching bucket wins; unseen regions fall to the shallowest match
    val ordered = buckets.sortBy(-_.depth).toArray
    def chunkOfSax(sax: Array[Int]): Int =
      ordered.find(_.matches(sax)).map(chunkOfBucket).getOrElse {
        // no prefix matches (region empty in the sample): hash for coverage
        (ISax.rootKey(sax) % nChunks + nChunks) % nChunks
      }
    val assign = (0L until spec.n.toLong).map(id => id -> chunkOfSax(saxOf(id))).toMap
    Partitioning.Table("DPISAX", nChunks, assign)
  }
}
