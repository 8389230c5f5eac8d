package repro.bench

import repro.experiments.Experiments

/** Fig. 17 — (a-c) index-build scalability; (d) comparison against DMESSI,
  * DMESSI-SW-BSF, DPiSAX, and Odyssey's partitioning schemes (Seismic).
  * Paper: (a) index time grows ~linearly with size at fixed nodes;
  * (b) index time halves as nodes double; (c) joint growth is flat;
  * (d) Odyssey FULL + WORK-STEAL-PREDICT beats DMESSI by up to 6.6x,
  * DMESSI-SW-BSF by 3.7x, DPISAX by 3.8x; DENSITY-AWARE beats EQUALLY-SPLIT.
  */
class Fig17IndexScalCompetitorsBench extends BenchTables {

  test("Fig. 17a-c: index creation scales with data and nodes") {
    val (a, b, c) = Experiments.fig17IndexScalability(spark)
    show(a); show(b); show(c)
    // (a) ~linear in dataset size: 8x data => 6..10x index secs
    val ia = a.rows.map(_.last.toDouble)
    val growth = ia.last / ia.head
    assert(growth > 5 && growth < 12, s"size-scaling factor $growth")
    // (b) doubling nodes roughly halves index secs
    val ib = b.rows.map(_.last.toDouble)
    ib.sliding(2).foreach { p =>
      if (p.length == 2) assert(p(1) < p(0) * 0.7, s"node scaling broke: $ib")
    }
    // (c) joint growth: buffer time stays ~constant
    val ic = c.rows.map(r => r(2).toDouble)
    assert(ic.max / ic.min < 1.5, s"joint scaling not flat: $ic")
  }

  test("Fig. 17d: Odyssey beats its competitors; DENSITY-AWARE beats EQUALLY-SPLIT") {
    val t = show(Experiments.fig17dCompetitors(spark))
    val col = "8 nodes"
    val dmessi = cell(t, "DMESSI", col)
    val swbsf = cell(t, "DMESSI-SW-BSF", col)
    val dpisax = cell(t, "DPISAX", col)
    val odFull = cell(t, "ODYSSEY FULL (WS-PREDICT)", col)
    val odEq = cell(t, "ODYSSEY EQUALLY-SPLIT", col)
    val odDa = cell(t, "ODYSSEY DENSITY-AWARE", col)
    assert(odFull < dmessi, s"Odyssey($odFull) must beat DMESSI($dmessi)")
    assert(odFull < swbsf * 1.02, s"Odyssey($odFull) vs DMESSI-SW-BSF($swbsf)")
    assert(odFull < dpisax * 1.02, s"Odyssey($odFull) vs DPISAX($dpisax)")
    assert(swbsf < dmessi, "system-wide BSF sharing must improve DMESSI")
    assert(odDa <= odEq * 1.05, s"DENSITY-AWARE($odDa) vs EQUALLY-SPLIT($odEq)")
    println(f"speedup vs DMESSI: ${dmessi / odFull}%.2fx (paper: up to 6.6x)")
    println(f"speedup vs DMESSI-SW-BSF: ${swbsf / odFull}%.2fx (paper: 3.7x)")
    println(f"speedup vs DPISAX: ${dpisax / odFull}%.2fx (paper: 3.8x)")
  }
}
