package repro.bench

import repro.experiments.Experiments

/** Table 1 — dataset roster (paper scale vs reproduction scale). */
class Table1DatasetsBench extends BenchTables {
  test("Table 1: datasets") {
    val t = show(Experiments.table1())
    assert(t.rows.length == 6)
    // lengths mirror the paper's
    val lens = t.rows.map(r => r(0) -> r(5).toInt).toMap
    assert(lens("Seismic") == 256 && lens("Deep") == 96 &&
           lens("Sift") == 128 && lens("Yan-TtI") == 200)
  }
}
