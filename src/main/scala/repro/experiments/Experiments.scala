package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.baselines.Competitors
import repro.cluster._
import repro.core.SeriesGen
import repro.core.SeriesGen.DatasetSpec
import repro.index.{Dtw, IndexConfig, SearchParams}

/** One experiment runner per evaluation exhibit (Table 1, Figs. 4-19).
  *
  * Each runner returns a rendered [[Table]] of the numbers the paper plots;
  * the bench suites print these tables (recorded in EXPERIMENTS.md) and
  * assert the paper's qualitative claims; the spark-submit jobs print them
  * standalone. Sizes default to reproduction scale (10^3-10^4 series) and
  * can be scaled through `Scale`.
  */
object Experiments {

  /** Reproduction-scale knobs (override for bigger runs via jobs args). */
  final case class Scale(n: Int = 4096, nQueries: Int = 40, nTrain: Int = 24)

  final case class Table(title: String, header: Seq[String], rows: Seq[Seq[String]]) {
    def render: String = {
      val all = header +: rows
      val widths = header.indices.map(i => all.map(r => r(i).length).max)
      def line(r: Seq[String]): String =
        r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
      val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
      (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
    }
  }

  private def f(x: Double): String =
    if (x == 0) "0"
    else if (x >= 100) f"$x%.1f"
    else if (x >= 0.01) f"$x%.4f"
    else f"$x%.3e" // keep tiny sim-times resolvable for ratio checks

  private val ic = IndexConfig(w = 8, leafCapacity = 32)

  // Odyssey always answers with thresholded priority queues; a modest fixed
  // TH stands in for the per-query sigmoid outside Fig. 6 (fine-grained
  // queues drive both intra-node balance and steal granularity)
  private val sp = SearchParams(threshold = 16)

  private def rs(k: Int): Partitioner = Partitioning.RandomShuffle(k)

  private def predictor(spark: SparkSession, spec: DatasetSpec, s: Scale) =
    OdysseyCluster.trainPredictor(spark, spec, s.nTrain, indexConfig = ic)

  // ---------------------------------------------------------------- Table 1
  def table1(s: Scale = Scale()): Table = {
    val paper = Map(
      "Random" -> ("100M-1600M", 256, "100-1600 GB"), "Seismic" -> ("100M", 256, "100 GB"),
      "Astro" -> ("270M", 256, "265 GB"), "Deep" -> ("1B", 96, "358 GB"),
      "Sift" -> ("1B", 128, "477 GB"), "Yan-TtI" -> ("1B", 200, "800 GB"))
    Table("Table 1: datasets (paper vs reproduction scale)",
      Seq("dataset", "paper #series", "paper len", "paper size", "repro #series", "repro len", "repro size MB"),
      SeriesGen.presets.all.map { name =>
        val spec = SeriesGen.presets.byName(name, s.n)
        val (pn, pl, ps) = paper(name)
        Seq(name, pn, pl.toString, ps, spec.n.toString, spec.length.toString,
            f"${spec.sizeBytes / 1e6}%.1f")
      })
  }

  // ----------------------------------------------------------------- Fig. 4
  /** Linear regression of query cost on initial BSF (Seismic). */
  def fig04Prediction(spark: SparkSession, s: Scale = Scale()): Table = {
    val spec = SeriesGen.presets.seismic(s.n)
    val tq = SeriesGen.trainingQueries(spec, s.nTrain * 2)
    val rep = repro.spark.DistributedSearch.run(spark, spec, _ => 0, tq, SearchParams(), ic)
    val stats = rep.head.queries
    val m = Prediction.fitOls(stats.map(_.approxBsf), stats.map(_.totalOps.toDouble))
    val sample = stats.sortBy(_.approxBsf).grouped(math.max(1, stats.length / 8)).map(_.head).toSeq
    Table("Fig. 4: execution-cost vs initial BSF (Seismic), linear fit",
      Seq("initial BSF", "measured ops", "predicted ops"),
      sample.map(q => Seq(f(q.approxBsf), q.totalOps.toString,
                          f"${m.predict(q.approxBsf)}%.0f")) :+
        Seq(s"slope=${f(m.slope)}", s"intercept=${f(m.intercept)}", f"r2=${m.r2}%.3f"))
  }

  // ----------------------------------------------------------------- Fig. 6
  /** Sigmoid TH fit + division-factor sweep (Seismic). */
  def fig06Threshold(spark: SparkSession, s: Scale = Scale()): (Table, Table) = {
    val spec = SeriesGen.presets.seismic(s.n)
    val fit = OdysseyCluster.trainThreshold(spark, spec, s.nTrain, indexConfig = ic)
    val fitTable = Table("Fig. 6a: sigmoid fit of median PQ size vs initial BSF (Seismic)",
      Seq("m", "M", "b", "c", "d"),
      Seq(Seq(f(fit.m), f(fit.M), f(fit.b), f(fit.c), f(fit.d))))
    val queries = SeriesGen.queries(spec, s.nQueries)
    val factors = Seq(1.0, 2.0, 4.0, 8.0, 16.0, 32.0, 64.0)
    val rows = factors.map { factor =>
      val cfg = ClusterConfig(1, 1, rs, scheduler = Static, steal = false,
                              indexConfig = ic, thresholds = Some((fit, factor)))
      val res = OdysseyCluster.run(spark, spec, queries, cfg)
      Seq(factor.toInt.toString, f(res.querySecs))
    }
    (fitTable, Table("Fig. 6b: query time vs TH division factor (Seismic, 1 node)",
                     Seq("division factor", "query secs (sim)"), rows))
  }

  // ---------------------------------------------------------------- Fig. 10
  /** Scheduling algorithms on Seismic, FULL replication, vs node count. */
  def fig10Scheduling(spark: SparkSession, s: Scale = Scale(),
                      nodes: Seq[Int] = Seq(1, 2, 4, 8, 16)): Table = {
    val spec = SeriesGen.presets.seismic(s.n)
    val queries = SeriesGen.queries(spec, s.nQueries)
    val pred = predictor(spark, spec, s)
    val algos: Seq[(String, SchedulerKind, Boolean)] = Seq(
      ("STATIC", Static, false), ("DYNAMIC", Dynamic, false),
      ("PREDICT-ST-UNSORTED", PredictStUnsorted, false), ("PREDICT-ST", PredictSt, false),
      ("PREDICT-DN", PredictDn, false),
      ("WORK-STEAL", Dynamic, true), ("WORK-STEAL-PREDICT", PredictDn, true))
    val rows = algos.map { case (name, kind, steal) =>
      val times = nodes.map { nn =>
        val cfg = ClusterConfig(nn, 1, rs, scheduler = kind, steal = steal,
                                params = sp, indexConfig = ic)
        f(OdysseyCluster.run(spark, spec, queries, cfg, Some(pred)).querySecs)
      }
      name +: times
    }
    Table("Fig. 10: scheduling algorithms, Seismic, FULL replication (query secs)",
          "algorithm" +: nodes.map(n => s"$n nodes"), rows)
  }

  // ---------------------------------------------------------------- Fig. 11
  /** Query-count scalability: j nodes answering j x q0 queries (Random). */
  def fig11QueryScalability(spark: SparkSession, s: Scale = Scale(),
                            q0: Int = 25): Table = {
    val spec = SeriesGen.presets.random(s.n)
    val rows = for ((name, k) <- Seq(("FULL", 1), ("PARTIAL-2", 2), ("PARTIAL-4", 4))) yield {
      val times = Seq(1, 2, 4, 8).map { j =>
        if (k > j) "-"
        else {
          val queries = SeriesGen.queries(spec, q0 * j)
          val cfg = ClusterConfig(j, k, rs, scheduler = Dynamic, steal = true,
                                  params = sp, indexConfig = ic)
          f(OdysseyCluster.run(spark, spec, queries, cfg).querySecs)
        }
      }
      name +: times
    }
    Table(s"Fig. 11: WORK-STEAL, j nodes answering j*$q0 queries (Random, query secs)",
          "strategy" +: Seq(1, 2, 4, 8).map(j => s"$j nodes/${j * q0}q"), rows)
  }

  // ---------------------------------------------------------------- Fig. 12
  /** Query time vs dataset size, 8 nodes, per replication strategy. */
  def fig12DataSize(spark: SparkSession, sizes: Seq[Int] = Seq(1024, 2048, 4096, 8192),
                    dataset: String = "Random", nQueries: Int = 25): Table = {
    val rows = for (k <- Seq(1, 2, 4, 8)) yield {
      val name = Layout(8, k).name
      val times = sizes.map { n =>
        val spec = SeriesGen.presets.byName(dataset, n)
        val queries = SeriesGen.queries(spec, nQueries)
        val cfg = ClusterConfig(8, k, rs, scheduler = Dynamic, steal = true,
                                params = sp, indexConfig = ic)
        f(OdysseyCluster.run(spark, spec, queries, cfg).querySecs)
      }
      name +: times
    }
    Table(s"Fig. 12: query secs for $nQueries queries vs dataset size ($dataset, 8 nodes)",
          "strategy" +: sizes.map(n => s"n=$n"), rows)
  }

  // ---------------------------------------------------------------- Fig. 13
  /** Throughput (queries/sec) on Random, FULL replication, WORK-STEAL. */
  def fig13Throughput(spark: SparkSession, s: Scale = Scale()): Table = {
    val spec = SeriesGen.presets.random(s.n)
    val queries = SeriesGen.queries(spec, s.nQueries)
    val rows = Seq(1, 2, 4, 8, 16).map { nn =>
      val cfg = ClusterConfig(nn, 1, rs, scheduler = Dynamic, steal = true,
                              params = sp, indexConfig = ic)
      val t = OdysseyCluster.run(spark, spec, queries, cfg).querySecs
      Seq(nn.toString, f(t), f(queries.length / t))
    }
    Table("Fig. 13: WORK-STEAL throughput (Random, FULL)",
          Seq("nodes", "query secs", "queries/sec"), rows)
  }

  // ---------------------------------------------------------------- Fig. 14
  /** Total index size per replication strategy, 8 nodes, all datasets. */
  def fig14IndexSize(spark: SparkSession, s: Scale = Scale()): Table = {
    val header = "dataset" +: Seq(1, 2, 4, 8).map(k => Layout(8, k).name) :+ "raw data"
    val rows = SeriesGen.presets.all.map { name =>
      val spec = SeriesGen.presets.byName(name, s.n)
      val queries = SeriesGen.queries(spec, 1)
      val sizes = Seq(1, 2, 4, 8).map { k =>
        val cfg = ClusterConfig(8, k, rs, scheduler = Static, steal = false,
                                bsfShare = false, indexConfig = ic)
        val res = OdysseyCluster.run(spark, spec, queries, cfg)
        f"${res.indexBytes / 1e6}%.2f MB"
      }
      name +: sizes :+ f"${spec.sizeBytes / 1e6}%.2f MB"
    }
    Table("Fig. 14: total index size, 8 nodes", header, rows)
  }

  // ---------------------------------------------------------------- Fig. 15
  /** Replication strategies on Seismic with WORK-STEAL-PREDICT: query time
    * and total time as the batch grows.
    */
  def fig15Replication(spark: SparkSession, s: Scale = Scale(),
                       queryCounts: Seq[Int] = Seq(5, 25, 100, 200)): (Table, Table) = {
    val spec = SeriesGen.presets.seismic(s.n)
    val pred = predictor(spark, spec, s)
    val results = for (k <- Seq(8, 4, 2, 1); nq <- queryCounts) yield {
      val queries = SeriesGen.queries(spec, nq)
      val cfg = ClusterConfig(8, k, rs, scheduler = PredictDn, steal = true,
                              params = sp, indexConfig = ic)
      ((k, nq), OdysseyCluster.run(spark, spec, queries, cfg, Some(pred)))
    }
    val m = results.toMap
    def tab(title: String, pick: RunResult => Double) = Table(title,
      "strategy" +: queryCounts.map(q => s"$q queries"),
      Seq(8, 4, 2, 1).map { k =>
        Layout(8, k).name +: queryCounts.map(nq => f(pick(m((k, nq)))))
      })
    (tab("Fig. 15a-b: query secs by replication (Seismic, WORK-STEAL-PREDICT, 8 nodes)", _.querySecs),
     tab("Fig. 15c-d: total secs (index + query) by replication (Seismic, 8 nodes)", _.totalSecs))
  }

  // ---------------------------------------------------------------- Fig. 16
  /** Replication strategies on the other real datasets, 100 queries. */
  def fig16RealDatasets(spark: SparkSession, s: Scale = Scale(),
                        nQueries: Int = 100): Table = {
    val rows = Seq("Astro", "Deep", "Sift", "Yan-TtI").map { name =>
      val spec = SeriesGen.presets.byName(name, s.n)
      val queries = SeriesGen.queries(spec, nQueries)
      val times = Seq(8, 4, 2, 1).map { k =>
        val cfg = ClusterConfig(8, k, rs, scheduler = PredictDn, steal = true,
                                params = sp, indexConfig = ic)
        f(OdysseyCluster.run(spark, spec, queries, cfg).querySecs)
      }
      name +: times
    }
    Table(s"Fig. 16: query secs by replication, $nQueries queries, 8 nodes",
          "dataset" +: Seq(8, 4, 2, 1).map(k => Layout(8, k).name), rows)
  }

  // ---------------------------------------------------------------- Fig. 17
  /** Index-build scalability: size sweep, node sweep, joint sweep. */
  def fig17IndexScalability(spark: SparkSession): (Table, Table, Table) = {
    val sizes = Seq(2048, 4096, 8192, 16384)
    val a = Table("Fig. 17a: index secs vs dataset size (Deep, EQUALLY-SPLIT, 16 nodes)",
      Seq("n series", "buffer secs", "tree secs", "index secs"),
      sizes.map { n =>
        val spec = SeriesGen.presets.deep(n)
        val cfg = ClusterConfig(16, 16, rs, scheduler = Static, steal = false,
                                bsfShare = false, indexConfig = ic)
        val r = OdysseyCluster.run(spark, spec, SeriesGen.queries(spec, 1), cfg)
        Seq(n.toString, f(r.bufferSecs), f(r.treeSecs), f(r.indexSecs))
      })
    val spec16 = SeriesGen.presets.deep(16384)
    val b = Table("Fig. 17b: index secs vs node count (Deep n=16384, EQUALLY-SPLIT)",
      Seq("nodes", "buffer secs", "tree secs", "index secs"),
      Seq(1, 2, 4, 8, 16).map { nn =>
        val cfg = ClusterConfig(nn, nn, rs, scheduler = Static, steal = false,
                                bsfShare = false, indexConfig = ic)
        val r = OdysseyCluster.run(spark, spec16, SeriesGen.queries(spec16, 1), cfg)
        Seq(nn.toString, f(r.bufferSecs), f(r.treeSecs), f(r.indexSecs))
      })
    val c = Table("Fig. 17c: joint scaling — n and nodes grow together (Random, EQUALLY-SPLIT)",
      Seq("nodes", "n series", "buffer secs", "tree secs"),
      Seq(1, 2, 4, 8).map { j =>
        val spec = SeriesGen.presets.random(2048 * j)
        val cfg = ClusterConfig(j, j, rs, scheduler = Static, steal = false,
                                bsfShare = false, indexConfig = ic)
        val r = OdysseyCluster.run(spark, spec, SeriesGen.queries(spec, 1), cfg)
        Seq(j.toString, spec.n.toString, f(r.bufferSecs), f(r.treeSecs))
      })
    (a, b, c)
  }

  /** Fig. 17d: WORK-STEAL-PREDICT vs competitors + partitioning schemes. */
  def fig17dCompetitors(spark: SparkSession, s: Scale = Scale(),
                        nodes: Seq[Int] = Seq(4, 8)): Table = {
    val spec = SeriesGen.presets.seismic(s.n)
    val queries = SeriesGen.queries(spec, s.nQueries)
    val pred = predictor(spark, spec, s)
    def run(cfg: ClusterConfig): String =
      f(OdysseyCluster.run(spark, spec, queries, cfg.copy(params = sp), Some(pred)).querySecs)
    val rows = Seq[(String, Int => ClusterConfig)](
      ("DMESSI", nn => Competitors.dmessi(nn, spec, ic)),
      ("DMESSI-SW-BSF", nn => Competitors.dmessiSwBsf(nn, spec, ic)),
      ("DPISAX", nn => Competitors.dpisax(nn, spec, ic)),
      ("ODYSSEY EQUALLY-SPLIT", nn => Competitors.odyssey(nn, nn,
        k => Partitioning.EquallySplit(spec.n.toLong, k), ic = ic)),
      ("ODYSSEY EQUALLY-SPLIT-RS", nn => Competitors.odyssey(nn, nn, rs, ic = ic)),
      ("ODYSSEY DENSITY-AWARE", nn => Competitors.odyssey(nn, nn,
        k => Partitioning.densityAware(spec, k, ic.w, lambda = 16), ic = ic)),
      ("ODYSSEY FULL (WS-PREDICT)", nn => Competitors.odyssey(nn, 1, rs, ic = ic)),
    ).map { case (name, mk) => name +: nodes.map(nn => run(mk(nn))) }
    Table("Fig. 17d: query secs vs competitors (Seismic)",
          "system" +: nodes.map(n => s"$n nodes"), rows)
  }

  // ---------------------------------------------------------------- Fig. 18
  /** 10-NN query answering (Random), replication x nodes. */
  def fig18Knn(spark: SparkSession, s: Scale = Scale(), k: Int = 10,
               nQueries: Int = 25): Table = {
    val spec = SeriesGen.presets.random(s.n)
    val queries = SeriesGen.queries(spec, nQueries)
    knnDtwSweep(spark, spec, queries, SearchParams(k = k),
                s"Fig. 18: $k-NN query secs (Random)")
  }

  // ---------------------------------------------------------------- Fig. 19
  /** DTW with 5% warping (Random), replication x nodes. */
  def fig19Dtw(spark: SparkSession, s: Scale = Scale(), warpFrac: Double = 0.05,
               nQueries: Int = 25): Table = {
    val spec = SeriesGen.presets.random(s.n)
    val queries = SeriesGen.queries(spec, nQueries)
    val r = math.max(1, (spec.length * warpFrac).toInt)
    knnDtwSweep(spark, spec, queries, SearchParams(mode = Dtw(r)),
                s"Fig. 19: DTW ${(warpFrac * 100).toInt}%% warping query secs (Random)")
  }

  private def knnDtwSweep(spark: SparkSession, spec: DatasetSpec,
                          queries: Array[Array[Double]], params: SearchParams,
                          title: String): Table = {
    val nodeCounts = Seq(2, 4, 8)
    val rows = Seq(("FULL", 1), ("PARTIAL-2", 2), ("EQUALLY-SPLIT", 0)).map { case (name, kk) =>
      val times = nodeCounts.map { nn =>
        val k = if (kk == 0) nn else kk
        if (k > nn) "-"
        else {
          val cfg = ClusterConfig(nn, k, rs, scheduler = Dynamic, steal = true,
                                  params = params.copy(threshold = sp.threshold),
                                  indexConfig = ic)
          f(OdysseyCluster.run(spark, spec, queries, cfg).querySecs)
        }
      }
      name +: times
    }
    Table(title, "strategy" +: nodeCounts.map(n => s"$n nodes"), rows)
  }
}
