package repro.bench

import repro.experiments.Experiments

/** Fig. 4 — correlation between initial BSF and execution cost (Seismic).
  * Paper: a clear positive linear trend justifying the PREDICT-* schedulers.
  */
class Fig04PredictionBench extends BenchTables {
  test("Fig. 4: cost-vs-BSF regression has a positive slope and real correlation") {
    val t = show(Experiments.fig04Prediction(spark))
    val tail = t.rows.last
    val slope = tail.head.stripPrefix("slope=").toDouble
    val r2 = tail(2).stripPrefix("r2=").toDouble
    assert(slope > 0, s"slope=$slope")
    assert(r2 > 0.3, s"r2=$r2 — paper's correlation should reproduce")
  }
}
