package repro.cluster

/** PARTIAL-k replication layout (§3.3, Fig. 7).
  *
  * With `nNodes` system nodes, PARTIAL-k splits the dataset into `k`
  * disjoint chunks and replicates each chunk on `nNodes / k` nodes:
  *
  *  - a **replication group** is the set of nodes storing the same chunk
  *    (size = replication degree = nNodes / k) — scheduling and stealing
  *    operate inside a group;
  *  - a **cluster** is a set of k nodes that collectively store the whole
  *    dataset (one node per chunk).
  *
  * PARTIAL-1 = FULL (every node holds everything);
  * PARTIAL-nNodes = EQUALLY-SPLIT (no replication).
  * A power-of-two node count supports 1 + log2(nNodes) degrees.
  */
final case class Layout(nNodes: Int, k: Int) {
  require(nNodes >= 1 && k >= 1 && k <= nNodes, s"bad layout nNodes=$nNodes k=$k")
  require(nNodes % k == 0, s"k=$k must divide nNodes=$nNodes")

  /** Number of chunks. */
  def nChunks: Int = k

  /** Replication degree (= group size = number of clusters). */
  def degree: Int = nNodes / k

  /** Node `n` stores chunk `n % k` (node n belongs to cluster n / k). */
  def chunkOfNode(node: Int): Int = node % k

  /** Nodes of the replication group storing chunk `c`. */
  def group(c: Int): Seq[Int] = (0 until degree).map(j => j * k + c)

  /** The clusters: each holds one node per chunk. */
  def clusters: Seq[Seq[Int]] = (0 until degree).map(j => (0 until k).map(c => j * k + c))

  def isFull: Boolean = k == 1
  def isEquallySplit: Boolean = k == nNodes

  def name: String =
    if (isFull) "FULL" else if (isEquallySplit) "EQUALLY-SPLIT" else s"PARTIAL-$k"
}

object Topology {

  /** The replication settings Odyssey supports for `nNodes` (powers of two
    * between 1 and nNodes that divide nNodes): 1 + log2(nNodes) of them.
    */
  def supportedKs(nNodes: Int): Seq[Int] =
    Iterator.iterate(1)(_ * 2).takeWhile(_ <= nNodes).filter(nNodes % _ == 0).toSeq
}
