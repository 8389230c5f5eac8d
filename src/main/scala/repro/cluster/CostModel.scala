package repro.cluster

/** Ops → simulated-seconds conversion (DESIGN.md §6).
  *
  * The paper's nodes have 128 cores; we model `ThreadsPerNode` worker
  * threads per node and a fixed per-thread op rate. Absolute values are
  * arbitrary (we compare shapes/ratios, not seconds), but every experiment
  * uses the same constants so ratios are meaningful.
  */
object CostModel {
  val ThreadsPerNode: Int = 16
  val OpsPerSec: Double = 1e8

  /** Single-thread time for `ops`. */
  def serialSecs(ops: Long): Double = ops / OpsPerSec

  /** Perfectly parallel time for `ops` on `threads` threads. */
  def parallelSecs(ops: Long, threads: Int = ThreadsPerNode): Double =
    ops / (threads * OpsPerSec)
}
