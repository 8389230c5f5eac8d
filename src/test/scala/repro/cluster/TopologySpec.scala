package repro.cluster

import org.scalatest.funsuite.AnyFunSuite

class TopologySpec extends AnyFunSuite {

  for (nNodes <- Seq(1, 2, 4, 8, 16); k <- Topology.supportedKs(nNodes)) {
    val layout = Layout(nNodes, k)

    test(s"PARTIAL-$k on $nNodes nodes: groups partition the node set") {
      val all = (0 until k).flatMap(layout.group)
      assert(all.sorted == (0 until nNodes))
      (0 until k).foreach(c => assert(layout.group(c).size == layout.degree))
    }

    test(s"PARTIAL-$k on $nNodes nodes: clusters each cover every chunk once") {
      assert(layout.clusters.size == layout.degree)
      layout.clusters.foreach { cl =>
        assert(cl.map(layout.chunkOfNode).sorted == (0 until k))
      }
      assert(layout.clusters.flatten.sorted == (0 until nNodes))
    }

    test(s"PARTIAL-$k on $nNodes nodes: node chunk matches its group") {
      (0 until nNodes).foreach { node =>
        assert(layout.group(layout.chunkOfNode(node)).contains(node))
      }
    }
  }

  test("supported degrees count is 1 + log2(nNodes)") {
    assert(Topology.supportedKs(8) == Seq(1, 2, 4, 8))
    assert(Topology.supportedKs(16).length == 5)
    assert(Topology.supportedKs(1) == Seq(1))
  }

  test("FULL and EQUALLY-SPLIT naming") {
    assert(Layout(8, 1).name == "FULL")
    assert(Layout(8, 8).name == "EQUALLY-SPLIT")
    assert(Layout(8, 2).name == "PARTIAL-2")
    assert(Layout(8, 1).isFull && Layout(8, 8).isEquallySplit)
  }

  test("replication degree arithmetic (paper's PARTIAL-4 example)") {
    // N=8, PARTIAL-4: 4 replication groups, 2 clusters, degree 2
    val l = Layout(8, 4)
    assert(l.nChunks == 4)
    assert(l.degree == 2)
    assert(l.clusters.size == 2)
    assert(l.group(0).size == 2)
  }

  test("invalid layouts are rejected") {
    intercept[IllegalArgumentException](Layout(8, 3))
    intercept[IllegalArgumentException](Layout(4, 8))
    intercept[IllegalArgumentException](Layout(0, 1))
  }
}
