package repro.bench

import repro.experiments.Experiments

/** Fig. 14 — total index size per replication strategy (8 nodes).
  * Paper: the index is small relative to the dataset; size scales with the
  * replication degree (FULL = 8x EQUALLY-SPLIT).
  */
class Fig14IndexSizeBench extends BenchTables {
  test("Fig. 14: index size tracks replication degree and stays small") {
    val t = show(Experiments.fig14IndexSize(spark))
    t.rows.foreach { r =>
      val name = r.head
      val Seq(full, p2, p4, eq) = r.slice(1, 5).map(_.replace(" MB", "").toDouble)
      val raw = r.last.replace(" MB", "").toDouble
      // the ratio tracks the replication degree of 8, modulo per-tree node
      // overhead (split into 8 shallow trees vs one deep tree)
      assert(full / eq > 4.5 && full / eq <= 10.5, s"$name: FULL/EQ = ${full / eq}")
      assert(p2 > p4 && p4 > eq, s"$name: sizes must decrease with k")
      assert(full < raw, s"$name: even the replicated index is below raw size")
      assert(eq < raw / 4, s"$name: unreplicated index is small vs data")
    }
  }
}
