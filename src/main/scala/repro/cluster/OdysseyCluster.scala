package repro.cluster

import org.apache.spark.sql.SparkSession
import repro.core.SeriesGen
import repro.core.SeriesGen.DatasetSpec
import repro.index.{IndexConfig, SearchParams, ThresholdModel}
import repro.index.ThresholdModel.SigmoidFit
import repro.spark.{BuildStatRow, ChunkReport, DistributedSearch, QueryStatRow}

/** Full Odyssey pipeline configuration (Fig. 3).
  *
  * @param nNodes      system nodes
  * @param k           PARTIAL-k replication (1 = FULL, nNodes = EQUALLY-SPLIT)
  * @param partitioner chunk assignment builder, given the chunk count
  * @param scheduler   intra-group query scheduler
  * @param steal       enable inter-node work stealing inside groups
  * @param bsfShare    share initial BSFs across replication groups (the
  *                    BSF-sharing channel + book-keeping array of §3.4)
  */
final case class ClusterConfig(
    nNodes: Int,
    k: Int,
    partitioner: Int => Partitioner,
    scheduler: SchedulerKind = PredictDn,
    steal: Boolean = true,
    bsfShare: Boolean = true,
    params: SearchParams = SearchParams(),
    indexConfig: IndexConfig = IndexConfig(),
    thresholds: Option[(SigmoidFit, Double)] = None,
    threads: Int = CostModel.ThreadsPerNode,
    nSend: Int = 4)

/** Everything an experiment needs: exact answers, the three simulated
  * times of the paper's evaluation (buffer, tree, query answering), and
  * diagnostics.
  */
final case class RunResult(
    config: ClusterConfig,
    answers: Map[Int, List[(Double, Long)]],
    bufferSecs: Double, treeSecs: Double, querySecs: Double,
    indexBytes: Long, nSteals: Int,
    reports: Seq[ChunkReport]) {
  def indexSecs: Double = bufferSecs + treeSecs
  def totalSecs: Double = indexSecs + querySecs
  def queryStats: Seq[QueryStatRow] = reports.flatMap(_.queries)
  def buildStats: Seq[BuildStatRow] = reports.map(_.build)
}

object OdysseyCluster {

  /** Run the five-stage pipeline for one configuration. */
  def run(spark: SparkSession, spec: DatasetSpec, queries: Array[Array[Double]],
          cfg: ClusterConfig,
          predictor: Option[Prediction.LinearModel] = None): RunResult = {
    val layout = Layout(cfg.nNodes, cfg.k)
    val part = cfg.partitioner(layout.nChunks)
    require(part.nChunks == layout.nChunks, "partitioner chunk count mismatch")
    val chunkOf = part.chunkOf _

    // Stages 1-2-4 (measurement): LOCAL pass, then SHARED pass if the BSF
    // channel is on and there is more than one group to share across.
    val local = DistributedSearch.run(spark, spec, chunkOf, queries, cfg.params,
                                      cfg.indexConfig, Map.empty, cfg.thresholds)
    val reports =
      if (cfg.bsfShare && layout.nChunks > 1) {
        val bounds = local.flatMap(_.queries)
          .groupBy(_.qid)
          .view.mapValues(_.map(_.approxBsf).min).toMap
        DistributedSearch.run(spark, spec, chunkOf, queries, cfg.params,
                              cfg.indexConfig, bounds, cfg.thresholds)
      } else local

    // Stage 5: exact global answers by merging per-chunk top-k lists.
    val answers = DistributedSearch.mergeAnswers(reports, cfg.params.k)

    // Stage 3 + timing: schedule and steal inside each replication group.
    val qids = queries.indices.toSeq
    var worstGroup = 0.0
    var steals = 0
    reports.foreach { rep =>
      val chunk = rep.build.chunk
      val byQid = rep.queries.map(q => q.qid -> q).toMap
      val works = byQid.view.mapValues { qs =>
        IntraNodeSim.plan(qs.qid, toRun(qs), cfg.threads)
      }.toMap
      val est: Int => Double = q =>
        predictor.map(_.predict(byQid(q).approxBsf)).getOrElse(1.0)
      val res = StealSim.simulate(layout.degree, works, qids, cfg.scheduler, est,
                                  steal = cfg.steal && layout.degree > 1,
                                  nSend = cfg.nSend, threads = cfg.threads,
                                  seed = 77L + chunk)
      worstGroup = math.max(worstGroup, res.makespan)
      steals += res.nSteals
    }

    val bufferSecs = reports.map(r => CostModel.parallelSecs(r.build.bufferOps, cfg.threads)).max
    val treeSecs   = reports.map(r => CostModel.parallelSecs(r.build.treeOps, cfg.threads)).max
    val indexBytes = reports.map(_.build.indexBytes).sum * layout.degree

    RunResult(cfg, answers, bufferSecs, treeSecs, worstGroup, indexBytes, steals, reports)
  }

  /** Rehydrate a [[repro.index.QueryRun]]-shaped record from a stats row
    * (only the fields the simulator consumes).
    */
  private def toRun(qs: QueryStatRow): repro.index.QueryRun =
    repro.index.QueryRun(
      topK = qs.topKDists.zip(qs.topKIds).toList,
      approxBsf = qs.approxBsf, approxOps = qs.approxOps,
      batchOps = qs.batchOps.toArray,
      pqStats = qs.tasks.iterator.map(t => repro.index.PqStat(t.batchId, t.topLb, t.leaves, t.procOps)).toArray,
      totalOps = qs.totalOps, nLeavesTouched = 0L, nRealDists = qs.nRealDists)

  /** Fit the paper's linear cost predictor (Fig. 4) on training queries run
    * against a FULL (single-chunk) index of the collection.
    */
  def trainPredictor(spark: SparkSession, spec: DatasetSpec, nTrain: Int,
                     params: SearchParams = SearchParams(),
                     indexConfig: IndexConfig = IndexConfig()): Prediction.LinearModel = {
    val tq = SeriesGen.trainingQueries(spec, nTrain)
    val rep = DistributedSearch.run(spark, spec, _ => 0, tq, params, indexConfig)
    val stats = rep.head.queries
    Prediction.fitOls(stats.map(_.approxBsf), stats.map(_.totalOps.toDouble))
  }

  /** Fit the TH sigmoid (Fig. 6a) on training queries: x = initial BSF,
    * y = median uncapped PQ size.
    */
  def trainThreshold(spark: SparkSession, spec: DatasetSpec, nTrain: Int,
                     params: SearchParams = SearchParams(),
                     indexConfig: IndexConfig = IndexConfig()): SigmoidFit = {
    val tq = SeriesGen.trainingQueries(spec, nTrain)
    val rep = DistributedSearch.run(spark, spec, _ => 0, tq,
                                    params.copy(threshold = Int.MaxValue), indexConfig)
    val pts = rep.head.queries.map { qs =>
      val sizes = qs.tasks.map(_.leaves.toDouble).sorted
      val med = if (sizes.isEmpty) 0.0
                else if (sizes.length % 2 == 1) sizes(sizes.length / 2)
                else (sizes(sizes.length / 2 - 1) + sizes(sizes.length / 2)) / 2
      (qs.approxBsf, med)
    }
    ThresholdModel.fit(pts)
  }
}
