package repro.cluster

/** Query execution-time prediction (§3.1, Fig. 4): ordinary least squares
  * of per-query cost on the query's *initial BSF* — the correlation the
  * paper exploits for its PREDICT-* schedulers.
  */
object Prediction {

  final case class LinearModel(slope: Double, intercept: Double, r2: Double) {
    def predict(x: Double): Double = slope * x + intercept
  }

  /** OLS fit of y on x; r2 reported for the benches (paper shows ~linear). */
  def fitOls(xs: Seq[Double], ys: Seq[Double]): LinearModel = {
    require(xs.length == ys.length && xs.nonEmpty, "bad regression input")
    val n = xs.length.toDouble
    val mx = xs.sum / n; val my = ys.sum / n
    var sxx = 0.0; var sxy = 0.0; var syy = 0.0
    xs.indices.foreach { i =>
      val dx = xs(i) - mx; val dy = ys(i) - my
      sxx += dx * dx; sxy += dx * dy; syy += dy * dy
    }
    val slope = if (sxx < 1e-12) 0.0 else sxy / sxx
    val intercept = my - slope * mx
    val r2 = if (sxx < 1e-12 || syy < 1e-12) 0.0 else (sxy * sxy) / (sxx * syy)
    LinearModel(slope, intercept, r2)
  }
}
