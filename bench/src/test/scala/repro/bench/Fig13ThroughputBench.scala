package repro.bench

import repro.experiments.Experiments

/** Fig. 13 — WORK-STEAL throughput (Random, FULL): queries/sec should rise
  * close to linearly with node count.
  */
class Fig13ThroughputBench extends BenchTables {
  test("Fig. 13: throughput scales with nodes") {
    val t = show(Experiments.fig13Throughput(spark))
    val tput = t.rows.map(r => r.head.toInt -> r(2).toDouble).toMap
    assert(tput(8) > tput(1) * 3, s"8-node throughput should be >3x 1-node: $tput")
    assert(tput(16) >= tput(8) * 0.9, "throughput must not collapse at 16 nodes")
  }
}
