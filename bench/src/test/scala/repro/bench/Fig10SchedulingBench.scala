package repro.bench

import repro.experiments.Experiments

/** Fig. 10 — scheduling algorithms on Seismic with FULL replication.
  * Paper: PREDICT-DN is the best non-stealing policy at high node counts
  * (up to 150% better than STATIC); WORK-STEAL-PREDICT beats PREDICT-DN
  * by up to ~2x at large node counts (Fig. 10a).
  */
class Fig10SchedulingBench extends BenchTables {
  test("Fig. 10: prediction + stealing dominate STATIC as nodes grow") {
    val t = show(Experiments.fig10Scheduling(spark))
    val at16 = (name: String) => cell(t, name, "16 nodes")
    assert(at16("PREDICT-DN") <= at16("STATIC") * 1.02,
           "PREDICT-DN must not lose to STATIC at 16 nodes")
    assert(at16("WORK-STEAL-PREDICT") <= at16("PREDICT-DN") * 1.02,
           "stealing must not hurt the best scheduler")
    assert(at16("WORK-STEAL-PREDICT") < at16("STATIC"),
           "the full Odyssey stack must beat naive static scheduling")
    // single node: all policies are within noise of each other
    val at1 = t.rows.map(r => cell(t, r.head, "1 nodes"))
    assert(at1.max / at1.min < 1.2)
  }
}
