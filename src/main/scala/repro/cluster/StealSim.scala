package repro.cluster

import scala.collection.mutable
import repro.cluster.IntraNodeSim.{QueryWork, TaskWork}
import repro.core.Rng

/** Event-driven simulation of one replication group answering a query
  * batch (§3.1 scheduling + §3.2.2 work stealing).
  *
  * Every node in the group holds the same chunk, so each query's execution
  * plan ([[IntraNodeSim.QueryWork]]) is identical across members. The
  * serial + traversal phases are opaque busy intervals. The PQ-processing
  * phase is *task-granular*: PQ tasks are list-scheduled in sorted order
  * onto the node's threads (matching [[QueryWork.soloSecs]] exactly when
  * undisturbed), and a task is stealable while it has not started yet.
  *
  * Stealing follows Algorithms 3-4: an idle node picks a random still-active
  * victim; the victim gives away the queues of up to `nSend` RS-batches that
  * satisfy the Take-Away property (rightmost = largest top lower bound =
  * most likely still unprocessed) and marks them stolen; the thief
  * re-traverses those batches on its own index replica (rebuild cost) and
  * processes them on its own threads.
  */
object StealSim {

  /** Ops charged per steal handshake (request + reply messages). Scaled to
    * the reproduction's workload sizes: a pair of small messages costs far
    * less than one priority queue's processing, as on the paper's cluster.
    */
  val HandshakeOps: Long = 2_000L

  final case class GroupResult(makespan: Double, perNodeFinish: Array[Double],
                               nSteals: Int, stolenOps: Long, processedOps: Long)

  /** One scheduled PQ task: absolute [start, end) on a specific thread. */
  private final case class Slot(task: TaskWork, start: Double, end: Double, thread: Int)

  /** List-schedule `tasks` in order onto threads with given absolute free
    * times; returns the slots and the updated thread clocks.
    */
  private def schedule(tasks: Seq[TaskWork], threadFree: Array[Double],
                       rate1: Double): (Vector[Slot], Array[Double]) = {
    val clocks = threadFree.clone()
    val slots = Vector.newBuilder[Slot]
    tasks.foreach { tk =>
      val th = clocks.indices.minBy(clocks)
      val start = clocks(th)
      val end = start + tk.ops / rate1
      slots += Slot(tk, start, end, th)
      clocks(th) = end
    }
    (slots.result(), clocks)
  }

  private final class Running(val qw: QueryWork, val pqStart: Double,
                              threads: Int, rate1: Double) {
    var slots: Vector[Slot] = schedule(qw.tasks, Array.fill(threads)(pqStart), rate1)._1
    val stolenBatches: mutable.Set[Int] = mutable.Set.empty
    def finish: Double = if (slots.isEmpty) pqStart else slots.map(_.end).max

    /** Slots not yet started at `t` (stealable region). */
    def pendingAt(t: Double): Vector[Slot] = slots.filter(_.start > t)

    /** Remove the given tasks (by identity within pending) and reschedule
      * the remaining pending slots onto the threads' current availability.
      */
    def remove(t: Double, taken: Set[TaskWork], threads: Int, rate1: Double): Unit = {
      val (fixed, pending) = slots.partition(_.start <= t)
      val keepPending = pending.filterNot(s => taken.contains(s.task))
      val threadFree = Array.fill(threads)(t)
      fixed.foreach(s => threadFree(s.thread) = math.max(threadFree(s.thread), s.end))
      val (resched, _) = schedule(keepPending.map(_.task), threadFree, rate1)
      slots = fixed ++ resched
    }
  }

  private final class NodeState {
    val queue: mutable.Queue[Int] = mutable.Queue.empty // static assignment
    var version: Int = 0
    var current: Running = _
    var stealBusyUntil: Double = -1.0
    var lastActive: Double = 0.0
    var done: Boolean = false
  }

  /** Simulate a group of `nNodes` nodes answering `works` (indexed by qid).
    *
    * @param kind  scheduler; static kinds pre-assign, dynamic kinds pull
    * @param est   predicted cost per query (used by PREDICT-* kinds)
    * @param steal enable inter-node work stealing
    */
  def simulate(nNodes: Int, works: Map[Int, QueryWork], qids: Seq[Int],
               kind: SchedulerKind, est: Int => Double,
               steal: Boolean, nSend: Int = 4,
               threads: Int = CostModel.ThreadsPerNode,
               seed: Long = 1234): GroupResult = {
    require(nNodes >= 1)
    val rate1 = CostModel.OpsPerSec // ops/sec of one thread
    val rng = new Rng.Stream(Rng.key(seed, nNodes.toLong))
    val nodes = Array.fill(nNodes)(new NodeState)

    val dynamicQueue = mutable.Queue.empty[Int]
    if (Scheduling.isDynamic(kind)) dynamicQueue ++= Scheduling.dynamicOrder(qids, est, kind)
    else {
      val assigned = kind match {
        case Static            => Scheduling.staticAssign(qids, nNodes)
        case PredictStUnsorted => Scheduling.predictAssign(qids, est, nNodes, sorted = false)
        case PredictSt         => Scheduling.predictAssign(qids, est, nNodes, sorted = true)
        case other             => throw new IllegalStateException(s"unexpected $other")
      }
      assigned.zipWithIndex.foreach { case (qs, n) => nodes(n).queue ++= qs }
    }

    var nSteals = 0
    var stolenOps = 0L
    var processedOps = 0L

    implicit val ord: Ordering[(Double, Int, Int)] = Ordering.by(e => -e._1)
    val events = mutable.PriorityQueue.empty[(Double, Int, Int)]
    (0 until nNodes).foreach(n => events.enqueue((0.0, n, 0)))

    def nextQuery(n: Int): Option[Int] = {
      val st = nodes(n)
      if (Scheduling.isDynamic(kind)) { if (dynamicQueue.nonEmpty) Some(dynamicQueue.dequeue()) else None }
      else if (st.queue.nonEmpty) Some(st.queue.dequeue())
      else None
    }

    def startQuery(n: Int, t: Double, qid: Int): Unit = {
      val st = nodes(n)
      val qw = works(qid)
      val pqStart = t + CostModel.serialSecs(qw.serialOps) + qw.traversalSecs
      st.current = new Running(qw, pqStart, threads, rate1)
      st.version += 1
      st.lastActive = st.current.finish
      processedOps += qw.serialOps + qw.pqOpsTotal
      events.enqueue((st.lastActive, n, st.version))
    }

    def attemptSteal(n: Int, t: Double): Boolean = {
      val candidates = nodes.indices.filter { m =>
        m != n && nodes(m).current != null && {
          val r = nodes(m).current
          r.pendingAt(t).exists(s => !r.stolenBatches(s.task.batchId))
        }
      }
      if (candidates.isEmpty) return false
      val m = candidates(rng.nextInt(candidates.length))
      val st = nodes(m); val r = st.current
      val pending = r.pendingAt(t).filterNot(s => r.stolenBatches(s.task.batchId))
      // Take-Away property: from the rightmost (largest top-lb) queues, take
      // whole RS-batches until nSend batches are chosen. Task order in the
      // slots vector is the sorted PQ-array order, so "rightmost" = last.
      val ordered = pending.sortBy(_.start)
      val chosen = mutable.LinkedHashSet.empty[Int]
      ordered.reverseIterator.foreach { s =>
        if (chosen.size < nSend) chosen += s.task.batchId
      }
      val taken = ordered.filter(s => chosen(s.task.batchId)).map(_.task)
      // profitability guard: giving away less work than the handshake costs
      // would only slow the system down — the victim declines (|S| = 0)
      if (taken.isEmpty || taken.map(_.ops).sum < 2 * HandshakeOps) return false
      r.stolenBatches ++= chosen
      r.remove(t, taken.toSet, threads, rate1)
      st.version += 1
      st.lastActive = r.finish
      events.enqueue((st.lastActive, m, st.version))
      // thief: handshake + rebuild of the stolen batches + processing,
      // list-scheduled on its own threads
      val rebuild = chosen.iterator.map(b => r.qw.rebuildOps.getOrElse(b, 0L)).sum
      val serialPart = (HandshakeOps + rebuild) / rate1
      val me = nodes(n)
      val (slots, _) = schedule(taken, Array.fill(threads)(t + serialPart), rate1)
      val busyUntil = if (slots.isEmpty) t + serialPart else slots.map(_.end).max
      me.version += 1
      me.stealBusyUntil = busyUntil
      me.lastActive = busyUntil
      nSteals += 1
      val ops = HandshakeOps + rebuild + taken.map(_.ops).sum
      stolenOps += ops
      processedOps += ops
      events.enqueue((busyUntil, n, me.version))
      true
    }

    /** Earliest future instant at which another node's state can change.
      * Retries are scheduled against these real wake points — never against
      * other nodes' retry events — so the loop always makes progress.
      */
    def nextWakePoint(n: Int, t: Double): Option[Double] = {
      var best = Double.PositiveInfinity
      nodes.indices.foreach { m =>
        if (m != n) {
          val s = nodes(m)
          if (s.current != null) {
            if (s.current.pqStart > t) best = math.min(best, s.current.pqStart)
            if (s.lastActive > t) best = math.min(best, s.lastActive)
          }
          if (s.stealBusyUntil > t) best = math.min(best, s.stealBusyUntil)
        }
      }
      if (best.isInfinity) None else Some(best)
    }

    while (events.nonEmpty) {
      val (t, n, v) = events.dequeue()
      val st = nodes(n)
      if (v == st.version && !st.done) {
        st.current = null
        st.stealBusyUntil = -1.0
        nextQuery(n) match {
          case Some(q) => startQuery(n, t, q)
          case None =>
            if (!steal) st.done = true
            else if (!attemptSteal(n, t)) {
              nextWakePoint(n, t) match {
                case Some(w) =>
                  st.version += 1
                  events.enqueue((math.max(w, t + 1e-9), n, st.version))
                case None => st.done = true
              }
            }
        }
      }
    }

    val finish = nodes.map(_.lastActive)
    GroupResult(if (finish.isEmpty) 0.0 else finish.max, finish, nSteals, stolenOps, processedOps)
  }
}
