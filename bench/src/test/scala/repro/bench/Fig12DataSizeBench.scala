package repro.bench

import repro.experiments.Experiments

/** Fig. 12 — query time vs dataset size (8 nodes). Paper: time grows
  * gracefully with data size, and more replication answers faster.
  */
class Fig12DataSizeBench extends BenchTables {
  test("Fig. 12: graceful growth with size; replication helps (Random + Yan-TtI)") {
    Seq("Random", "Yan-TtI").foreach { ds =>
      val t = show(Experiments.fig12DataSize(spark, dataset = ds))
      // growth with size for every strategy
      t.rows.foreach { r =>
        val xs = r.tail.map(_.toDouble)
        assert(xs.last > xs.head, s"$ds ${r.head}: no growth $xs")
      }
      // FULL <= EQUALLY-SPLIT at the largest size
      val full = cell(t, "FULL", "n=8192")
      val eq = cell(t, "EQUALLY-SPLIT", "n=8192")
      assert(full <= eq * 1.05, s"$ds: FULL=$full EQUALLY-SPLIT=$eq")
    }
  }
}
