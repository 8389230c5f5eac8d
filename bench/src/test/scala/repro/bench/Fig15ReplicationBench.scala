package repro.bench

import repro.experiments.Experiments

/** Fig. 15 — replication strategies on Seismic with WORK-STEAL-PREDICT.
  * Paper: (a-b) more replication => lower query time, consistently across
  * batch sizes; (c-d) for small batches total time *inverts* (FULL pays the
  * biggest index-build bill), and a large enough batch amortizes it.
  */
class Fig15ReplicationBench extends BenchTables {
  test("Fig. 15: replication trades index-build time against query time") {
    val (q, tot) = Experiments.fig15Replication(spark)
    show(q); show(tot)
    // (a-b) FULL answers faster than EQUALLY-SPLIT once the batch is big
    // enough to balance (tiny batches quantize badly over 8 nodes)
    q.header.drop(3).foreach { col =>
      assert(cell(q, "FULL", col) <= cell(q, "EQUALLY-SPLIT", col) * 1.05,
             s"$col: FULL should win query time")
    }
    // (c-d) small batch: FULL's total is the worst of the strategies
    val small = tot.header(1)
    assert(cell(tot, "FULL", small) > cell(tot, "EQUALLY-SPLIT", small),
           "small batch: index build dominates, FULL loses total time")
    // large batch: the gap closes or inverts
    val large = tot.header.last
    val ratioSmall = cell(tot, "FULL", small) / cell(tot, "EQUALLY-SPLIT", small)
    val ratioLarge = cell(tot, "FULL", large) / cell(tot, "EQUALLY-SPLIT", large)
    assert(ratioLarge < ratioSmall, "a bigger batch must amortize FULL's build cost")
  }
}
