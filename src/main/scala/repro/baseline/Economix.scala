package repro.baseline

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.ml.LogisticRegression
import scala.collection.mutable
import scala.util.Random

/** Economix [Aggarwal, Li, Yu & Zhao, ICDE'17] — matrix-factorization edge
  * classification with structure and content.
  *
  * As in the paper's adaptation (Sec. V, "Comparative methods"), each
  * interaction dimension together with a bucketized interaction count is a
  * *word*, making every edge a small document. We factorize the edge × word
  * matrix by SGD (with random negative words), propagate latent vectors
  * over the line graph (edges sharing an endpoint — the structural part),
  * and classify the latent vectors with logistic regression trained on the
  * labeled edges. Runs on the driver: the latent model is tiny at our
  * scale, and only featurization touches the full edge list.
  */
object Economix {

  final case class Params(latentDim: Int = 16, mfIters: Int = 15,
                          sgdRate: Double = 0.05, negSamples: Int = 2,
                          smoothIters: Int = 2, smoothAlpha: Double = 0.5,
                          countBuckets: Int = 4, seed: Long = 13)

  /** Bucketize an interaction count: 1 / 2–3 / 4–7 / 8+. */
  def bucket(c: Double, buckets: Int): Int =
    math.min(buckets - 1, (math.log(c) / math.log(2.0)).toInt match {
      case x if x < 0 => 0
      case x          => x
    })

  def run(spark: SparkSession, edges: DataFrame, interactions: DataFrame,
          trainEdges: DataFrame, targets: DataFrame,
          params: Params = Params()): DataFrame = {
    import spark.implicits._
    val rng = new Random(params.seed)

    // ---- edge documents -------------------------------------------------
    val withInter = edges.select("src", "dst")
      .join(interactions.select("src", "dst", "inter"), Seq("src", "dst"), "left")
      .as[(Long, Long, Seq[Double])]
      .collect()
    val edgeIds = withInter.map { case (s, d, _) => (s, d) }
    val edgeIdx = edgeIds.zipWithIndex.toMap
    val nEdges = edgeIds.length

    val docs: Array[Array[Int]] = withInter.map { case (_, _, inter) =>
      if (inter == null) Array.empty[Int]
      else inter.zipWithIndex.collect {
        case (c, j) if c > 0 => j * params.countBuckets + bucket(c, params.countBuckets)
      }.toArray
    }
    val nWords = interactions.select(size($"inter")).as[Int].head() * params.countBuckets

    // ---- SGD matrix factorization ---------------------------------------
    val x = Array.fill(nEdges, params.latentDim)(rng.nextGaussian() * 0.1)
    val y = Array.fill(nWords, params.latentDim)(rng.nextGaussian() * 0.1)
    def sgdStep(e: Int, w: Int, target: Double): Unit = {
      var dot = 0.0
      var j = 0
      while (j < params.latentDim) { dot += x(e)(j) * y(w)(j); j += 1 }
      val err = dot - target
      j = 0
      while (j < params.latentDim) {
        val xj = x(e)(j)
        x(e)(j) -= params.sgdRate * (err * y(w)(j) + 1e-4 * xj)
        y(w)(j) -= params.sgdRate * (err * xj + 1e-4 * y(w)(j))
        j += 1
      }
    }
    var it = 0
    while (it < params.mfIters) {
      var e = 0
      while (e < nEdges) {
        docs(e).foreach { w =>
          sgdStep(e, w, 1.0)
          var s = 0
          while (s < params.negSamples) { sgdStep(e, rng.nextInt(nWords), 0.0); s += 1 }
        }
        e += 1
      }
      it += 1
    }

    // ---- structural propagation over the line graph ---------------------
    val byNode = mutable.HashMap.empty[Long, mutable.ArrayBuffer[Int]]
    edgeIds.zipWithIndex.foreach { case ((s, d), i) =>
      byNode.getOrElseUpdate(s, mutable.ArrayBuffer.empty) += i
      byNode.getOrElseUpdate(d, mutable.ArrayBuffer.empty) += i
    }
    var si = 0
    var cur = x
    while (si < params.smoothIters) {
      val next = Array.fill(nEdges, params.latentDim)(0.0)
      val cnt = new Array[Int](nEdges)
      byNode.valuesIterator.foreach { es =>
        // average of incident edges at this node, added to each member
        val avg = new Array[Double](params.latentDim)
        es.foreach { e =>
          var j = 0
          while (j < params.latentDim) { avg(j) += cur(e)(j); j += 1 }
        }
        var j = 0
        while (j < params.latentDim) { avg(j) /= es.length; j += 1 }
        es.foreach { e =>
          var j2 = 0
          while (j2 < params.latentDim) { next(e)(j2) += avg(j2); j2 += 1 }
          cnt(e) += 1
        }
      }
      var e = 0
      while (e < nEdges) {
        var j = 0
        while (j < params.latentDim) {
          val neighborAvg = if (cnt(e) == 0) cur(e)(j) else next(e)(j) / cnt(e)
          next(e)(j) = (1 - params.smoothAlpha) * cur(e)(j) + params.smoothAlpha * neighborAvg
          j += 1
        }
        e += 1
      }
      cur = next
      si += 1
    }

    // ---- supervised classification on latent vectors --------------------
    val train = trainEdges.select("src", "dst", "label").as[(Long, Long, String)].collect()
    val trainX = train.flatMap { case (s, d, _) => edgeIdx.get((s, d)).map(cur) }
    val trainY = train.flatMap { case (s, d, l) => edgeIdx.get((s, d)).map(_ => l) }
    val lr = LogisticRegression.train(trainX, trainY)

    val targetRows = targets.select("src", "dst").as[(Long, Long)].collect()
    val preds = targetRows.map { case (s, d) =>
      val p = edgeIdx.get((s, d)) match {
        case Some(e) => lr.predictLabel(cur(e))
        case None    => repro.wechat.RelationType.Unknown
      }
      (s, d, p)
    }
    spark.createDataset(preds.toSeq).toDF("src", "dst", "pred")
  }
}
