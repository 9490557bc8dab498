package repro.model

/** Evaluation metrics for the learned models (Table 3): weighted mean
  * absolute percentage error, median/90th-percentile relative errors,
  * Pearson correlation, and inference throughput.
  */
object Metrics {

  final case class Report(wmape: Double, p50: Double, p90: Double, corr: Double)

  /** WMAPE = Σ|y-ŷ| / Σ|y|. */
  def wmape(y: Array[Double], yhat: Array[Double]): Double = {
    require(y.length == yhat.length && y.nonEmpty, "mismatched metric inputs")
    val num = y.indices.map(i => math.abs(y(i) - yhat(i))).sum
    val den = y.map(math.abs).sum
    if (den == 0) 0.0 else num / den
  }

  /** Percentile of per-sample relative errors |y-ŷ|/|y|. */
  def relErrPercentile(y: Array[Double], yhat: Array[Double], q: Double): Double = {
    require(y.length == yhat.length && y.nonEmpty, "mismatched metric inputs")
    val errs = y.indices.map(i => math.abs(y(i) - yhat(i)) / math.max(1e-9, math.abs(y(i)))).sorted
    val idx = math.min(errs.size - 1, math.max(0, math.ceil(q * errs.size).toInt - 1))
    errs(idx)
  }

  /** Pearson correlation coefficient. */
  def pearson(y: Array[Double], yhat: Array[Double]): Double = {
    require(y.length == yhat.length && y.length >= 2, "need >=2 samples")
    val n = y.length
    val my = y.sum / n; val mh = yhat.sum / n
    var num = 0.0; var dy = 0.0; var dh = 0.0
    var i = 0
    while (i < n) {
      val a = y(i) - my; val b = yhat(i) - mh
      num += a * b; dy += a * a; dh += b * b
      i += 1
    }
    if (dy == 0 || dh == 0) 0.0 else num / math.sqrt(dy * dh)
  }

  def report(y: Array[Double], yhat: Array[Double]): Report =
    Report(wmape(y, yhat), relErrPercentile(y, yhat, 0.5), relErrPercentile(y, yhat, 0.9),
      pearson(y, yhat))
}
