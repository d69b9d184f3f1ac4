package repro.ml

/** Evaluation metrics used throughout the paper's tables. */
object Metrics {

  /** Pearson correlation between predictions and actuals (raw space). */
  def pearson(pred: Seq[Double], actual: Seq[Double]): Double = {
    require(pred.length == actual.length && pred.nonEmpty, "mismatched metric inputs")
    val n = pred.length.toDouble
    val mp = pred.sum / n
    val ma = actual.sum / n
    var cov = 0.0; var vp = 0.0; var va = 0.0
    var i = 0
    while (i < pred.length) {
      val dp = pred(i) - mp; val da = actual(i) - ma
      cov += dp * da; vp += dp * dp; va += da * da
      i += 1
    }
    if (vp < 1e-18 || va < 1e-18) 0.0 else cov / math.sqrt(vp * va)
  }

  /** Relative errors |pred - actual| / actual (actuals clamped away from 0). */
  def relErrors(pred: Seq[Double], actual: Seq[Double]): Seq[Double] = {
    require(pred.length == actual.length && pred.nonEmpty, "mismatched metric inputs")
    pred.zip(actual).map { case (p, a) => math.abs(p - a) / math.max(1e-6, math.abs(a)) }
  }

  def percentile(values: Seq[Double], q: Double): Double = {
    require(values.nonEmpty && q >= 0 && q <= 1, "bad percentile input")
    val s = values.sorted
    s(math.min(s.length - 1, (q * (s.length - 1)).round.toInt))
  }

  /** Median relative error as a percentage — the paper's "Median Error". */
  def medianErrorPct(pred: Seq[Double], actual: Seq[Double]): Double =
    percentile(relErrors(pred, actual), 0.5) * 100.0

  /** 95th-percentile relative error as a percentage (Table 7). */
  def p95ErrorPct(pred: Seq[Double], actual: Seq[Double]): Double =
    percentile(relErrors(pred, actual), 0.95) * 100.0
}
