package repro.bench

import repro.experiments.Experiments

/** Fig. 16 — replication comparison on the other real datasets (100
  * queries): the Seismic trend (more replication => faster answers) holds.
  */
class Fig16RealDatasetsBench extends BenchTables {
  test("Fig. 16: replication helps on every dataset") {
    val t = show(Experiments.fig16RealDatasets(spark))
    t.rows.foreach { r =>
      val eq = cell(t, r.head, "EQUALLY-SPLIT")
      val full = cell(t, r.head, "FULL")
      assert(full <= eq * 1.05, s"${r.head}: FULL=$full EQ=$eq")
    }
  }
}
