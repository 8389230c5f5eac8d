package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.Experiments

/** Shared spark-submit harness: builds the session and prints tables.
  * Usage: spark-submit --class repro.jobs.<Name> <jar> [nSeries] [nQueries]
  */
object Harness {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions", "64")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def scale(args: Array[String]): Experiments.Scale = {
    val n = args.lift(0).map(_.toInt).getOrElse(4096)
    val q = args.lift(1).map(_.toInt).getOrElse(40)
    Experiments.Scale(n = n, nQueries = q)
  }
}

/** Table 1 — dataset roster. */
object Table1Datasets {
  def main(args: Array[String]): Unit =
    println(Experiments.table1(Harness.scale(args)).render)
}

/** Fig. 4 — cost-vs-initial-BSF regression. */
object Fig04Prediction {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig04")
    println(Experiments.fig04Prediction(spark, Harness.scale(args)).render)
    spark.stop()
  }
}

/** Fig. 6 — TH sigmoid fit + division-factor sweep. */
object Fig06Threshold {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig06")
    val (a, b) = Experiments.fig06Threshold(spark, Harness.scale(args))
    println(a.render); println(b.render)
    spark.stop()
  }
}

/** Fig. 10 — scheduling algorithms (Seismic, FULL). */
object Fig10Scheduling {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig10")
    println(Experiments.fig10Scheduling(spark, Harness.scale(args)).render)
    spark.stop()
  }
}

/** Fig. 11 — query-count scalability (Random). */
object Fig11QueryScalability {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig11")
    println(Experiments.fig11QueryScalability(spark, Harness.scale(args)).render)
    spark.stop()
  }
}

/** Fig. 12 — query time vs dataset size (8 nodes). */
object Fig12DataSize {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig12")
    println(Experiments.fig12DataSize(spark).render)
    println(Experiments.fig12DataSize(spark, dataset = "Yan-TtI").render)
    spark.stop()
  }
}

/** Fig. 13 — throughput (Random, FULL). */
object Fig13Throughput {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig13")
    println(Experiments.fig13Throughput(spark, Harness.scale(args)).render)
    spark.stop()
  }
}

/** Fig. 14 — index sizes per replication strategy. */
object Fig14IndexSize {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig14")
    println(Experiments.fig14IndexSize(spark, Harness.scale(args)).render)
    spark.stop()
  }
}

/** Fig. 15 — replication strategies (Seismic, WORK-STEAL-PREDICT). */
object Fig15Replication {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig15")
    val (a, b) = Experiments.fig15Replication(spark, Harness.scale(args))
    println(a.render); println(b.render)
    spark.stop()
  }
}

/** Fig. 16 — replication on the other real datasets. */
object Fig16RealDatasets {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig16")
    println(Experiments.fig16RealDatasets(spark, Harness.scale(args)).render)
    spark.stop()
  }
}

/** Fig. 17a-c — index-build scalability. */
object Fig17IndexScalability {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig17abc")
    val (a, b, c) = Experiments.fig17IndexScalability(spark)
    println(a.render); println(b.render); println(c.render)
    spark.stop()
  }
}

/** Fig. 17d — comparison against DMESSI / DMESSI-SW-BSF / DPiSAX. */
object Fig17dCompetitors {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig17d")
    println(Experiments.fig17dCompetitors(spark, Harness.scale(args)).render)
    spark.stop()
  }
}

/** Fig. 18 — 10-NN (Random). */
object Fig18Knn {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig18")
    println(Experiments.fig18Knn(spark, Harness.scale(args)).render)
    spark.stop()
  }
}

/** Fig. 19 — DTW with 5% warping (Random). */
object Fig19Dtw {
  def main(args: Array[String]): Unit = {
    val spark = Harness.session("fig19")
    println(Experiments.fig19Dtw(spark, Harness.scale(args)).render)
    spark.stop()
  }
}
