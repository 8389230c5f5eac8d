package repro.spark

import repro.{Oracle, SparkSpec}
import repro.core.SeriesGen
import repro.core.SeriesGen.presets
import repro.cluster.Partitioning
import repro.index.{Dtw, IndexConfig, SearchParams, Search}

class DistributedSearchSpec extends SparkSpec {

  // ---- oracle-checked end-to-end: Spark distributed NN == DuckDB brute force ----
  for (name <- Seq("Random", "Seismic", "Deep"); nChunks <- Seq(1, 4)) {
    test(s"distributed 1-NN matches the DuckDB oracle ($name, chunks=$nChunks)") {
      import spark.implicits._
      val n = 400
      val spec = presets.byName(name, n)
      val queries = SeriesGen.queries(spec, 5)
      val part = Partitioning.RandomShuffle(nChunks)
      val reports = DistributedSearch.run(spark, spec, part.chunkOf, queries, SearchParams())
      val answers = DistributedSearch.mergeAnswers(reports, k = 1)
      val answersDf = answers.toSeq.map { case (qid, topk) => (qid, topk.head._1) }
        .toDF("qid", "nndist")
      Oracle.assertEquivalent(
        answersDf, SeriesFrame.BruteForceNnSql,
        "series"  -> SeriesFrame.explodedSeries(spark, spec),
        "queries" -> SeriesFrame.explodedQueries(spark, queries))
    }
  }

  for (k <- Seq(1, 2, 4, 8)) {
    test(s"answers are invariant to the partitioning (chunks=$k)") {
      val n = 500
      val spec = presets.seismic(n)
      val queries = SeriesGen.queries(spec, 6)
      val whole = DistributedSearch.mergeAnswers(
        DistributedSearch.run(spark, spec, _ => 0, queries, SearchParams()), 1)
      val part = Partitioning.EquallySplit(n.toLong, k)
      val split = DistributedSearch.mergeAnswers(
        DistributedSearch.run(spark, spec, part.chunkOf, queries, SearchParams()), 1)
      queries.indices.foreach { q =>
        assert(math.abs(whole(q).head._1 - split(q).head._1) < 1e-9, s"q=$q")
      }
    }
  }

  test("k-NN merge across chunks equals single-index k-NN") {
    val n = 600; val k = 5
    val spec = presets.seismic(n)
    val queries = SeriesGen.queries(spec, 4)
    val part = Partitioning.RandomShuffle(4)
    val split = DistributedSearch.mergeAnswers(
      DistributedSearch.run(spark, spec, part.chunkOf, queries, SearchParams(k = k)), k)
    val data = (0L until n.toLong).map(id => (id, SeriesGen.series(spec, id)))
    queries.indices.foreach { q =>
      val brute = Search.bruteForce(data.iterator, queries(q), k = k)
      split(q).zip(brute).foreach { case ((dg, _), (db, _)) =>
        assert(math.abs(dg - db) < 1e-9, s"q=$q")
      }
    }
  }

  test("DTW distributed search merges to the brute-force DTW answer") {
    val n = 250
    val spec = presets.random(n, length = 128)
    val queries = SeriesGen.queries(spec, 3)
    val r = math.max(1, spec.length / 20) // 5% warping
    val part = Partitioning.RandomShuffle(2)
    val merged = DistributedSearch.mergeAnswers(
      DistributedSearch.run(spark, spec, part.chunkOf, queries, SearchParams(mode = Dtw(r))), 1)
    val data = (0L until n.toLong).map(id => (id, SeriesGen.series(spec, id)))
    queries.indices.foreach { q =>
      val brute = Search.bruteForce(data.iterator, queries(q), Dtw(r)).head
      assert(math.abs(merged(q).head._1 - brute._1) < 1e-9, s"q=$q")
    }
  }

  test("shared start bounds do not change answers but cut ops") {
    val n = 900
    val spec = presets.seismic(n)
    val queries = SeriesGen.queries(spec, 6)
    val part = Partitioning.EquallySplit(n.toLong, 4)
    val local = DistributedSearch.run(spark, spec, part.chunkOf, queries, SearchParams())
    val bounds = local.flatMap(_.queries).groupBy(_.qid)
      .view.mapValues(_.map(_.approxBsf).min).toMap
    val shared = DistributedSearch.run(spark, spec, part.chunkOf, queries, SearchParams(),
                                       startBounds = bounds)
    val aL = DistributedSearch.mergeAnswers(local, 1)
    val aS = DistributedSearch.mergeAnswers(shared, 1)
    queries.indices.foreach(q => assert(math.abs(aL(q).head._1 - aS(q).head._1) < 1e-9))
    val opsL = local.flatMap(_.queries).map(_.totalOps).sum
    val opsS = shared.flatMap(_.queries).map(_.totalOps).sum
    assert(opsS < opsL)
  }

  test("build stats report every chunk with the right populations") {
    val n = 300
    val spec = presets.random(n)
    val part = Partitioning.EquallySplit(n.toLong, 3)
    val reports = DistributedSearch.run(spark, spec, part.chunkOf,
                                        SeriesGen.queries(spec, 1), SearchParams())
    assert(reports.map(_.build.chunk) == Seq(0, 1, 2))
    assert(reports.map(_.build.nSeries).sum == n)
    reports.foreach { r =>
      assert(r.build.bufferOps == r.build.nSeries * spec.length)
      assert(r.build.indexBytes > 0)
      assert(r.queries.length == 1)
    }
  }

  test("thresholds option caps PQ sizes through the sigmoid model") {
    val n = 800
    val spec = presets.seismic(n)
    val queries = SeriesGen.queries(spec, 3)
    // a flat sigmoid forcing TH = 48/16 = 3
    val fit = repro.index.ThresholdModel.SigmoidFit(48, 48, 1, 1, 0)
    val reports = DistributedSearch.run(spark, spec, _ => 0, queries, SearchParams(),
                                        thresholds = Some((fit, 16.0)))
    reports.flatMap(_.queries).flatMap(_.tasks).foreach(t => assert(t.leaves <= 3))
  }

  test("SynthData data-series entry points produce the documented shapes") {
    val df = repro.SynthData.dataSeries(spark, "Deep", 50)
    assert(df.columns.toSeq == Seq("id", "values"))
    assert(df.count() == 50)
    val ex = repro.SynthData.dataSeriesExploded(spark, "Deep", 10)
    assert(ex.columns.toSeq == Seq("id", "pos", "val"))
    assert(ex.count() == 10L * 96)
  }
}
