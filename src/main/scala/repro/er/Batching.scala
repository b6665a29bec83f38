package repro.er

import repro.linalg.Rng

/** Stratified mini-batch index streams.
  *
  * Datasets like Monitor are >95% negative (paper §5.1); plain batch-16
  * sampling then yields batches with zero positives and huge per-sample
  * weight spikes, making training variance dominate the comparison. Each
  * balanced batch draws half its indices from each class (minority indices
  * recycle with reshuffling), which is the variance-reduced equivalent of
  * class-weighted BCE. Falls back to plain shuffled batches when a class is
  * absent.
  */
object Batching {

  def balancedBatches(labels: Array[Double], batchSize: Int, rng: Rng): Seq[Array[Int]] = {
    val pos = labels.indices.filter(labels(_) == 1.0).toArray
    val neg = labels.indices.filter(labels(_) != 1.0).toArray
    val b = math.max(batchSize, 2)
    if (pos.isEmpty || neg.isEmpty) {
      rng.shuffle(labels.indices.toSeq).toArray.grouped(b).toSeq
    } else {
      val nSteps = math.max(1, math.ceil(labels.length.toDouble / b).toInt)
      val half = math.max(b / 2, 1)
      def stream(idx: Array[Int]): Iterator[Int] =
        Iterator.continually(rng.shuffle(idx.toSeq)).flatten
      val ps = stream(pos); val ns = stream(neg)
      (0 until nSteps).map(_ => (ps.take(half) ++ ns.take(half)).toArray)
    }
  }
}
