package repro.bench

import repro.experiments.Experiments

/** Fig. 11 — WORK-STEAL scales with the query count: j nodes answer j x 25
  * queries in about the time 1 node answers 25 (Random, FULL replication).
  */
class Fig11QueryScalabilityBench extends BenchTables {
  test("Fig. 11: time stays ~flat when queries and nodes grow together") {
    val t = show(Experiments.fig11QueryScalability(spark))
    val full = t.rows.find(_.head == "FULL").get.tail.map(_.toDouble)
    val base = full.head
    full.foreach(v => assert(v < base * 1.6 && v > base * 0.4,
      s"FULL row not ~flat: $full"))
  }
}
