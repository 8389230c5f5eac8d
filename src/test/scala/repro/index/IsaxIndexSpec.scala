package repro.index

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Cost, ISax, SeriesGen}
import repro.core.SeriesGen.presets

class IsaxIndexSpec extends AnyFunSuite {

  private def dataset(n: Int, name: String = "Seismic"): Seq[(Long, Array[Double])] = {
    val spec = presets.byName(name, n)
    (0L until n.toLong).map(id => (id, SeriesGen.series(spec, id)))
  }

  private def collectLeaves(root: TreeNode): Seq[TreeNode] =
    if (root.isLeaf) Seq(root)
    else collectLeaves(root.child0) ++ collectLeaves(root.child1)

  for (n <- Seq(50, 300, 1000); cap <- Seq(8, 32); w <- Seq(4, 8)) {
    test(s"index holds every series exactly once (n=$n, cap=$cap, w=$w)") {
      val idx = IsaxIndex.build(dataset(n).iterator, IndexConfig(w, cap))
      val ids = idx.rootsSorted.flatMap { case (_, r) => collectLeaves(r) }
        .flatMap(_.entries).map(_.id)
      assert(ids.length == n)
      assert(ids.toSet == (0L until n.toLong).toSet)
      assert(idx.nSeries == n)
    }
  }

  test("leaves respect capacity unless every segment is at max cardinality") {
    val idx = IsaxIndex.build(dataset(2000).iterator, IndexConfig(w = 8, leafCapacity = 16))
    idx.rootsSorted.foreach { case (_, root) =>
      collectLeaves(root).foreach { leaf =>
        if (leaf.entries.length > 16) assert(leaf.bits.forall(_ == ISax.MaxBits))
      }
    }
  }

  test("every entry's word matches its leaf's (word, bits) prefix") {
    val idx = IsaxIndex.build(dataset(800).iterator, IndexConfig(w = 8, leafCapacity = 8))
    idx.rootsSorted.foreach { case (_, root) =>
      collectLeaves(root).foreach { leaf =>
        leaf.entries.foreach { e =>
          leaf.bits.indices.foreach { seg =>
            val b = leaf.bits(seg)
            assert((e.sax(seg) >>> (ISax.MaxBits - b)) == leaf.word(seg),
                   s"seg=$seg bits=$b")
          }
        }
      }
    }
  }

  test("inner nodes carry no entries; children refine the parent word") {
    val idx = IsaxIndex.build(dataset(800).iterator, IndexConfig(w = 4, leafCapacity = 8))
    def walk(node: TreeNode): Unit =
      if (!node.isLeaf) {
        assert(node.entries == null)
        val seg = node.splitSeg
        Seq(node.child0, node.child1).zipWithIndex.foreach { case (c, bit) =>
          assert(c.bits(seg) == node.bits(seg) + 1)
          assert(c.word(seg) == node.word(seg) * 2 + bit)
          walk(c)
        }
      }
    idx.rootsSorted.foreach { case (_, r) => walk(r) }
  }

  test("root keys agree with the entries they hold") {
    val idx = IsaxIndex.build(dataset(500).iterator, IndexConfig(w = 8, leafCapacity = 16))
    idx.rootsSorted.foreach { case (key, root) =>
      collectLeaves(root).flatMap(_.entries).foreach { e =>
        assert(ISax.rootKey(e.sax) == key)
      }
    }
  }

  test("buffer counts sum to n and match subtree populations") {
    val idx = IsaxIndex.build(dataset(600).iterator, IndexConfig())
    val counts = idx.bufferCounts
    assert(counts.values.sum == 600)
    idx.rootsSorted.foreach { case (key, root) =>
      assert(counts(key) == collectLeaves(root).map(_.entries.length).sum)
    }
  }

  test("build stats are consistent") {
    val cost = new Cost
    val idx = IsaxIndex.build(dataset(400).iterator, IndexConfig(w = 8, leafCapacity = 16), cost)
    val bs = idx.buildStats
    assert(bs.nSeries == 400)
    assert(bs.bufferOps == 400L * 256)
    assert(bs.treeOps > 0)
    assert(bs.nRoots == idx.rootsSorted.length)
    assert(bs.indexBytes > 0)
    assert(cost.ops == bs.bufferOps + bs.treeOps)
    // leaves/inner counts match an explicit walk
    var leaves = 0; var inner = 0
    def walk(n: TreeNode): Unit = if (n.isLeaf) leaves += 1 else { inner += 1; walk(n.child0); walk(n.child1) }
    idx.rootsSorted.foreach { case (_, r) => walk(r) }
    assert(bs.nLeaves == leaves && bs.nInner == inner)
  }

  test("index size is small relative to the raw data (Fig. 14 sanity)") {
    val n = 2000
    val idx = IsaxIndex.build(dataset(n).iterator, IndexConfig())
    val raw = n.toLong * 256 * 8
    assert(idx.buildStats.indexBytes < raw / 4)
  }

  test("clustered data concentrates into fewer buffers than random data") {
    val nClusteredBufs = IsaxIndex.build(dataset(1000, "Astro").iterator, IndexConfig()).bufferCounts.size
    val nRandomBufs    = IsaxIndex.build(dataset(1000, "Random").iterator, IndexConfig()).bufferCounts.size
    assert(nClusteredBufs < nRandomBufs)
  }

  test("ragged series are rejected") {
    val bad = Iterator((0L, new Array[Double](64)), (1L, new Array[Double](65)))
    intercept[IllegalArgumentException](IsaxIndex.build(bad, IndexConfig()))
  }

  test("empty input is rejected") {
    intercept[IllegalArgumentException](IsaxIndex.build(Iterator.empty, IndexConfig()))
  }
}
