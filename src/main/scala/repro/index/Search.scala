package repro.index

import scala.collection.mutable
import repro.core.{Cost, Distances, ISax}

/** Distance mode: whole-matching Euclidean, or DTW with a Sakoe–Chiba
  * band of radius `radius` points (LB_Keogh + envelope-PAA lower bounds).
  */
sealed trait Mode extends Serializable
case object Euclidean extends Mode
final case class Dtw(radius: Int) extends Mode { require(radius >= 0) }

/** Search knobs (§3.2.1).
  *
  * @param nsb       number of RS-batches the root subtrees are grouped into
  *                  (paper: best when equal to the worker-thread count)
  * @param threshold TH — max leaves per priority queue; when the active PQ
  *                  of an RS-batch reaches TH it is closed and a fresh one
  *                  is started (Int.MaxValue = uncapped)
  * @param k         number of nearest neighbours
  */
final case class SearchParams(nsb: Int = 16, threshold: Int = Int.MaxValue,
                              mode: Mode = Euclidean, k: Int = 1) {
  require(nsb >= 1 && k >= 1 && threshold >= 1)
}

/** One processed priority queue: which RS-batch built it, the priority of
  * its top element, leaves it held, and the ops spent processing it.
  */
final case class PqStat(batchId: Int, topLb: Double, leaves: Int, procOps: Long)

/** Full per-(chunk, query) execution record. `batchOps(b)` is the tree
  * traversal + PQ construction cost of RS-batch b — exactly what a stealing
  * node pays to *rebuild* that batch's queues from its own replica.
  */
final case class QueryRun(
    topK: List[(Double, Long)],   // ascending (dist, id), local answer(s)
    approxBsf: Double,            // local initial BSF (k-th best of approx leaf)
    approxOps: Long,
    batchOps: Array[Long],
    pqStats: Array[PqStat],       // in processed (sorted) order
    totalOps: Long,
    nLeavesTouched: Long,
    nRealDists: Long) {
  def bestDist: Double = if (topK.isEmpty) Double.PositiveInfinity else topK.head._1
  def bestId: Long = if (topK.isEmpty) -1L else topK.head._2
}

/** Precomputed query context shared by all phases. */
final class QueryCtx(val values: Array[Double], val mode: Mode, w: Int,
                     segSizes: Array[Int]) {
  val paa: Array[Double] = repro.core.Paa.of(values, w)
  val sax: Array[Int] = ISax.word(paa)
  // DTW-only: LB_Keogh envelope and its PAAs
  val (envUp, envLo): (Array[Double], Array[Double]) = mode match {
    case Dtw(r)    => Distances.envelope(values, r)
    case Euclidean => (null, null)
  }
  val (envUpPaa, envLoPaa): (Array[Double], Array[Double]) = mode match {
    case Dtw(_)    => (repro.core.Paa.of(envUp, w), repro.core.Paa.of(envLo, w))
    case Euclidean => (null, null)
  }

  /** Lower bound of the real distance for an index node's word region. */
  def nodeLb(node: TreeNode): Double = mode match {
    case Euclidean => ISax.mindistPaaToWord(paa, segSizes, node.word, node.bits)
    case Dtw(_)    => ISax.mindistEnvToWord(envUpPaa, envLoPaa, segSizes, node.word, node.bits)
  }

  private val fullBits = Array.fill(w)(ISax.MaxBits)

  /** Lower bound of the real distance for a single indexed entry, from its
    * full-cardinality word (the index stores words, not PAAs — MESSI-style).
    */
  def entryLb(e: Entry): Double = mode match {
    case Euclidean => ISax.mindistPaaToWord(paa, segSizes, e.sax, fullBits)
    case Dtw(_)    => ISax.mindistEnvToWord(envUpPaa, envLoPaa, segSizes, e.sax, fullBits)
  }

  /** Real distance, early-abandoning against `bound`. For DTW a LB_Keogh
    * cascade runs first (itself a DTW lower bound).
    */
  def realDist(e: Entry, bound: Double, cost: Cost): Double = mode match {
    case Euclidean => Distances.edEarlyAbandon(values, e.values, bound, cost)
    case Dtw(r) =>
      val lbk = Distances.lbKeogh(e.values, envUp, envLo, bound, cost)
      if (lbk >= bound) Double.PositiveInfinity
      else Distances.dtwBand(values, e.values, r, bound, cost)
  }
}

/** Bounded max-heap over (dist, id): keeps the k smallest distances seen.
  * Ids are deduplicated — the approximate phase and the PQ phase may both
  * visit the same leaf, and a series must count once in a k-NN answer.
  */
final class KnnHeap(val k: Int) {
  private val heap = mutable.PriorityQueue.empty[(Double, Long)](Ordering.by(_._1))
  private val ids = mutable.Set.empty[Long]
  def bound: Double = if (heap.size < k) Double.PositiveInfinity else heap.head._1
  def offer(dist: Double, id: Long): Boolean =
    if (dist < bound && !ids.contains(id)) {
      heap.enqueue((dist, id))
      ids += id
      if (heap.size > k) ids -= heap.dequeue()._2
      true
    } else false
  def toSortedList: List[(Double, Long)] = heap.toList.sortBy(_._1)
}

object Search {

  /** Approximate search: descend to the leaf matching the query word and
    * scan it — gives the initial BSF (§2, Fig. 2). Returns the heap of the
    * k best leaf candidates (real distances to actual series).
    */
  def approx(index: IsaxIndex, ctx: QueryCtx, cost: Cost, k: Int = 1): KnnHeap = {
    val heap = new KnnHeap(k)
    val roots = index.rootsSorted
    if (roots.isEmpty) return heap
    val qKey = ISax.rootKey(ctx.sax)
    val root = roots.find(_._1 == qKey).map(_._2).getOrElse {
      // no matching subtree: take the root with the smallest lower bound
      cost.add(roots.length.toLong * ctx.paa.length)
      roots.minBy { case (_, n) => ctx.nodeLb(n) }._2
    }
    var node = root
    while (!node.isLeaf) {
      cost.add(1)
      val b   = node.bits(node.splitSeg)
      val bit = (ctx.sax(node.splitSeg) >>> (ISax.MaxBits - b - 1)) & 1
      val next = if (bit == 0) node.child0 else node.child1
      // an empty sibling can exist right after a split; fall to the other
      node = if (next.isLeaf && next.entries.isEmpty) (if (bit == 0) node.child1 else node.child0)
             else next
      if (node.isLeaf && node.entries.isEmpty) return heap
    }
    node.entries.foreach { e =>
      val d = ctx.realDist(e, heap.bound, cost)
      heap.offer(d, e.id)
    }
    heap
  }

  /** Exact search (§3.2.1): approximate phase for the initial BSF, tree
    * traversal per RS-batch populating size-thresholded priority queues,
    * PQ array sorted by top priority, then in-order PQ processing with
    * per-entry lower-bound filtering and early-abandoning real distances.
    *
    * @param startBound  an externally shared BSF (k-th best); PositiveInfinity
    *                    when the node has received nothing. The local answer
    *                    list only ever contains local series, so merging
    *                    per-chunk results stays exact under any sharing.
    * @param thresholdOf when set, overrides `params.threshold` with a TH
    *                    derived from the query's local initial BSF (the
    *                    sigmoid model of [[ThresholdModel]])
    */
  def exact(index: IsaxIndex, query: Array[Double], params: SearchParams,
            startBound: Double = Double.PositiveInfinity,
            thresholdOf: Double => Int = null): QueryRun = {
    val cost = new Cost
    val ctx = new QueryCtx(query, params.mode, index.config.w, index.segSizes)

    val heap = approx(index, ctx, cost, params.k)
    val approxBsf = heap.bound
    val approxOps = cost.ops
    var bound = math.min(startBound, heap.bound)
    val th = if (thresholdOf == null) params.threshold
             else math.max(2, thresholdOf(approxBsf))

    val roots = index.rootsSorted
    val nsb = math.min(params.nsb, roots.length)
    val batchOps = new Array[Long](nsb)
    // (batchId, leaves-with-lb, topLb) per priority queue
    val pqs = mutable.ArrayBuffer.empty[(Int, mutable.ArrayBuffer[(TreeNode, Double)])]
    var leavesTouched = 0L

    // ---- tree traversal phase: prune with the initial bound ----
    var b = 0
    while (b < nsb) {
      val before = cost.ops
      val lo = b * roots.length / nsb
      val hi = (b + 1) * roots.length / nsb
      var active = mutable.ArrayBuffer.empty[(TreeNode, Double)]
      def flush(): Unit = { if (active.nonEmpty) { pqs += ((b, active)); active = mutable.ArrayBuffer.empty } }
      var r = lo
      while (r < hi) {
        val stack = mutable.ArrayDeque[TreeNode](roots(r)._2)
        while (stack.nonEmpty) {
          val node = stack.removeLast()
          cost.add(ctx.paa.length)
          val lb = ctx.nodeLb(node)
          if (lb < bound) {
            if (node.isLeaf) {
              if (node.entries.nonEmpty) {
                active += ((node, lb))
                leavesTouched += 1
                if (active.length >= th) flush()
              }
            } else { stack.append(node.child0); stack.append(node.child1) }
          }
        }
        r += 1
      }
      flush()
      batchOps(b) = cost.ops - before
      b += 1
    }

    // ---- PQ preprocessing: sort queue array by top priority ----
    val ordered = pqs.map { case (bid, leaves) =>
      val sorted = leaves.sortBy(_._2)
      (bid, sorted, sorted.head._2)
    }.sortBy(_._3).toArray

    // ---- PQ processing phase ----
    var nReal = 0L
    val stats = new Array[PqStat](ordered.length)
    var p = 0
    while (p < ordered.length) {
      val (bid, leaves, topLb) = ordered(p)
      val before = cost.ops
      var li = 0
      var abandoned = false
      while (li < leaves.length && !abandoned) {
        val (leaf, lb) = leaves(li)
        if (lb >= bound) abandoned = true // queue is lb-sorted: the rest prune too
        else {
          val entries = leaf.entries
          var ei = 0
          while (ei < entries.length) {
            val e = entries(ei)
            cost.add(ctx.paa.length)
            if (ctx.entryLb(e) < bound) {
              val d = ctx.realDist(e, bound, cost)
              nReal += 1
              if (heap.offer(d, e.id)) bound = math.min(bound, heap.bound)
            }
            ei += 1
          }
        }
        li += 1
      }
      stats(p) = PqStat(bid, topLb, leaves.length, cost.ops - before)
      p += 1
    }

    QueryRun(heap.toSortedList, approxBsf, approxOps, batchOps, stats,
             totalOps = cost.ops, nLeavesTouched = leavesTouched, nRealDists = nReal)
  }

  /** Brute-force reference (tests): exact k-NN by scanning everything. */
  def bruteForce(series: Iterator[(Long, Array[Double])], query: Array[Double],
                 mode: Mode = Euclidean, k: Int = 1): List[(Double, Long)] = {
    val cost = new Cost
    val heap = new KnnHeap(k)
    series.foreach { case (id, v) =>
      val d = mode match {
        case Euclidean => Distances.ed(query, v)
        case Dtw(r)    => Distances.dtwBand(query, v, r, Double.PositiveInfinity, cost)
      }
      heap.offer(d, id)
    }
    heap.toSortedList
  }
}
