package repro.cluster

import repro.index.QueryRun

/** Intra-node timing (§3.2.1): converts one [[QueryRun]]'s op breakdown
  * into the three phases a node spends on a query.
  *
  *  - the initial-BSF approximate search is sequential;
  *  - the tree-traversal phase runs one thread per RS-batch with helping
  *    capped at HelpTH extra threads per batch, so its makespan is bounded
  *    below by both total/threads and the largest batch split HelpTH+1 ways;
  *  - the PQ-processing phase is list scheduling of atomic PQ tasks in
  *    sorted order on the node's threads — this is where the threshold TH
  *    earns its keep (few huge queues => one thread drags the phase).
  */
object IntraNodeSim {

  val HelpTH = 4

  /** One PQ-processing task: which RS-batch owns it and its single-thread ops. */
  final case class TaskWork(batchId: Int, ops: Long)

  /** Per-(node, query) execution plan consumed by [[StealSim]].
    *
    * @param rebuildOps what a *stealing* node pays to re-traverse batch b
    *                   and reconstruct its queues from its own replica
    */
  final case class QueryWork(qid: Int, serialOps: Long, traversalSecs: Double,
                             tasks: Vector[TaskWork], rebuildOps: Map[Int, Long]) {
    def pqOpsTotal: Long = tasks.iterator.map(_.ops).sum

    /** Undisturbed single-node execution time on `threads` threads. */
    def soloSecs(threads: Int): Double =
      CostModel.serialSecs(serialOps) + traversalSecs +
        listScheduleMakespan(tasks.map(t => CostModel.serialSecs(t.ops)), threads)
  }

  /** Makespan of atomic tasks pulled in order by `threads` workers. */
  def listScheduleMakespan(taskSecs: Seq[Double], threads: Int): Double = {
    if (taskSecs.isEmpty) return 0.0
    val clocks = new Array[Double](math.max(1, threads))
    taskSecs.foreach { s =>
      val i = clocks.indices.minBy(clocks)
      clocks(i) += s
    }
    clocks.max
  }

  /** Traversal-phase makespan with RS-batch helping (Algorithm 2, lines 11-14). */
  def traversalSecs(batchOps: Array[Long], threads: Int): Double = {
    if (batchOps.isEmpty) return 0.0
    val total = batchOps.sum
    val maxB  = batchOps.max
    math.max(CostModel.parallelSecs(total, threads),
             CostModel.parallelSecs(maxB, math.min(threads, 1 + HelpTH)))
  }

  /** Build the [[QueryWork]] plan for a measured run. */
  def plan(qid: Int, run: QueryRun, threads: Int = CostModel.ThreadsPerNode): QueryWork = {
    val rebuild = run.batchOps.zipWithIndex.map { case (ops, b) => b -> ops }.toMap
    QueryWork(
      qid,
      serialOps = run.approxOps,
      traversalSecs = traversalSecs(run.batchOps, threads),
      tasks = run.pqStats.iterator.map(s => TaskWork(s.batchId, s.procOps)).toVector,
      rebuildOps = rebuild,
    )
  }
}
