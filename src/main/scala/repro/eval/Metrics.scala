package repro.eval

/** Evaluation metrics used by the paper: PRAUC (average precision, the
  * paper's primary metric, §5.1) and F1 (Table 7).
  */
object Metrics {

  /** Average precision — the step-interpolation PRAUC sklearn's
    * `average_precision_score` computes: AP = Σ_k (R_k − R_{k−1}) · P_k over
    * descending *distinct* score thresholds. Tie-aware: all items with an
    * equal score enter at one threshold (saturated sigmoids produce exact
    * 1.0/0.0 ties; breaking them by input order would reward or punish
    * arbitrary ordering).
    */
  def prauc(scores: Array[Double], labels: Array[Double]): Double = {
    require(scores.length == labels.length, "prauc length mismatch")
    val nPos = labels.count(_ == 1.0)
    if (nPos == 0) return 0.0
    val byScore = scores.indices.groupBy(scores(_)).toSeq.sortBy(-_._1)
    var tp = 0
    var seen = 0
    var ap = 0.0
    byScore.foreach { case (_, idx) =>
      val dTp = idx.count(labels(_) == 1.0)
      tp += dTp
      seen += idx.size
      if (dTp > 0) ap += dTp.toDouble / nPos * (tp.toDouble / seen)
    }
    ap
  }

  def precisionRecallF1(scores: Array[Double], labels: Array[Double],
                        threshold: Double): (Double, Double, Double) = {
    var tp = 0; var fp = 0; var fn = 0
    scores.indices.foreach { i =>
      val pred = scores(i) >= threshold
      if (pred && labels(i) == 1.0) tp += 1
      else if (pred) fp += 1
      else if (labels(i) == 1.0) fn += 1
    }
    val p = if (tp + fp == 0) 0.0 else tp.toDouble / (tp + fp)
    val r = if (tp + fn == 0) 0.0 else tp.toDouble / (tp + fn)
    val f1 = if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    (p, r, f1)
  }

  /** Max F1 over all score thresholds — the usual EM-paper protocol
    * (threshold tuned on a validation split drawn from the same
    * distribution; at our scale we report the attainable optimum, applied
    * identically to every method). */
  def bestF1(scores: Array[Double], labels: Array[Double]): Double = {
    val thresholds = scores.distinct.sorted
    if (thresholds.isEmpty) return 0.0
    thresholds.foldLeft(0.0)((best, t) => math.max(best, precisionRecallF1(scores, labels, t)._3))
  }

  def meanStd(xs: Seq[Double]): (Double, Double) = {
    require(xs.nonEmpty, "meanStd of empty seq")
    val m = xs.sum / xs.size
    val v = xs.map(x => (x - m) * (x - m)).sum / xs.size
    (m, math.sqrt(v))
  }

  def fmtMeanStd(xs: Seq[Double]): String = {
    val (m, s) = meanStd(xs)
    f"$m%.4f ± $s%.4f"
  }
}
