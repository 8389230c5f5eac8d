package repro.bench

import repro.experiments.Experiments

/** Fig. 6 — TH sigmoid fit and the division-factor sweep (Seismic).
  * Paper: dividing the fitted median PQ size by a factor (16 for Seismic)
  * improves query time over factor 1 (few huge queues = intra-node
  * imbalance), with diminishing/reversing returns at extreme factors.
  */
class Fig06ThresholdBench extends BenchTables {
  test("Fig. 6: sigmoid fit exists; moderate division factors beat factor 1") {
    val (fit, sweep) = Experiments.fig06Threshold(spark)
    show(fit); show(sweep)
    val times = sweep.rows.map(r => r.head.toInt -> r(1).toDouble).toMap
    val best = times.values.min
    assert(times(16) <= times(1) + 1e-9,
           s"factor 16 (${times(16)}) should not lose to factor 1 (${times(1)})")
    assert(best < times(1) * 1.001, "some factor must improve on no-division")
  }
}
