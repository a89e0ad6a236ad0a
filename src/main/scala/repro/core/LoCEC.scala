package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions.col
import org.apache.spark.storage.StorageLevel
import repro.ml.{CommCNN, GBDT, LogisticRegression}

/** A community with an observed (survey-derived) majority label. */
final case class LabeledComm(ego: Long, comm: Int, label: String)

/** End-to-end LoCEC (Algorithm 2): division → aggregation → combination,
  * with per-phase wall-clock timings for the Table VI reproduction. */
object LoCEC {

  /** Which community classifier Phase II uses. */
  sealed trait Variant
  case object Xgb extends Variant // LoCEC-XGB
  case object Cnn extends Variant // LoCEC-CNN

  final case class Params(
      variant: Variant = Cnn,
      k: Int = 20, // paper's parameter study (Fig. 10) picks k = 20
      interDims: Int = 7,
      featDims: Int = 2,
      gnPatienceFrac: Double = 0.5,
      gbdt: GBDT.Params = GBDT.Params(),
      cnn: CommCNN.Config = CommCNN.Config(),
      lr: LogisticRegression.Params = LogisticRegression.Params(),
      maxTrainCommunities: Int = 50000)

  /** Phase timings in seconds (paper's Table VI reports hours). */
  final case class Timings(trainingSec: Double, phase1Sec: Double,
                           phase2Sec: Double, phase3Sec: Double) {
    def totalSec: Double = trainingSec + phase1Sec + phase2Sec + phase3Sec
  }

  final case class Result(assigns: Dataset[EgoAssign], commFeats: Dataset[CommFeat],
                          commPreds: Dataset[CommPred], commModel: CommModel,
                          edgePreds: DataFrame, timings: Timings)

  /** Reusable Phase I/II-feature outputs — lets callers (e.g. the Table IV
    * harness) evaluate both LoCEC variants without re-running division and
    * aggregation, which are variant-independent. */
  final case class Precomputed(assigns: Dataset[EgoAssign], commFeats: Dataset[CommFeat])

  private def timed[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Run the full pipeline.
    *
    * @param edges        canonical (src, dst) edge list (src < dst)
    * @param interactions (src, dst, inter: array<double>) — sparse; missing
    *                     pairs mean zero interactions
    * @param userFeatures per-user individual feature vectors f_u
    * @param trainEdges   (src, dst, label) — the observed (survey) labels
    *                     available for training; major types only
    * @param predictEdges (src, dst) edges to label; defaults to all edges
    */
  def run(spark: SparkSession, edges: DataFrame, interactions: DataFrame,
          userFeatures: collection.Map[Long, Array[Double]],
          trainEdges: DataFrame, params: Params = Params(),
          predictEdges: Option[DataFrame] = None,
          precomputed: Option[Precomputed] = None): Result = {
    import spark.implicits._

    // ---- Phase I: division — ego networks + local communities ----------
    val (phase1, phase1Sec) = timed {
      precomputed match {
        case Some(p) => (null: DataFrame, p.assigns)
        case None =>
          val inner = EgoNetworks.egoInnerEdges(spark, edges).persist(StorageLevel.MEMORY_AND_DISK)
          val assigns = LocalCommunities.detect(spark, edges, params.gnPatienceFrac)
            .persist(StorageLevel.MEMORY_AND_DISK)
          assigns.count()
          inner.count()
          (inner, assigns)
      }
    }
    val (inner, assigns) = phase1

    // ---- Phase II (features): Eq. 1–3 community feature matrices -------
    val (commFeats, phase2aSec) = timed {
      precomputed match {
        case Some(p) => p.commFeats
        case None =>
          val cf = CommunityFeatures.compute(spark, assigns, inner, interactions,
            userFeatures, params.k, params.interDims, params.featDims)
            .persist(StorageLevel.MEMORY_AND_DISK)
          cf.count()
          cf
      }
    }

    // ---- model training (the paper trains CommCNN beforehand) ----------
    val (commModel, trainingSec) = timed {
      val labeled = CommunityFeatures.labels(spark, commFeats, trainEdges).as[LabeledComm]
      val samples = commFeats
        .joinWith(labeled, commFeats("ego") === labeled("ego") &&
                           commFeats("comm") === labeled("comm"))
        .orderBy(col("_1.ego"), col("_1.comm")) // deterministic sub-sampling
        .take(params.maxTrainCommunities)
        .map { case (cf, lc) => (cf, lc.label) }
        .toSeq
      require(samples.nonEmpty, "no labeled communities — check trainEdges")
      params.variant match {
        case Xgb => CommunityClassifier.trainXgb(samples, params.gbdt)
        case Cnn => CommunityClassifier.trainCnn(samples, params.cnn)
      }
    }

    // ---- Phase II (classification) -------------------------------------
    val (commPreds, phase2bSec) = timed {
      val cp = CommunityClassifier.classify(spark, commFeats, commModel)
        .persist(StorageLevel.MEMORY_AND_DISK)
      cp.count()
      cp
    }

    // ---- Phase III: combination — Eq. 4 features + LR ------------------
    val (edgePreds, phase3Sec) = timed {
      val target = predictEdges.getOrElse(edges.select("src", "dst"))
      val allFeats = EdgeLabeler.features(spark,
        target.select("src", "dst").union(trainEdges.select("src", "dst")).distinct(),
        assigns, commPreds).persist(StorageLevel.MEMORY_AND_DISK)
      val trainFeats = allFeats
        .join(trainEdges.select("src", "dst", "label"), Seq("src", "dst"))
        .select("feats", "label")
        .as[(Seq[Double], String)]
        .collect()
        .map { case (f, l) => (f.toArray, l) }
        .toSeq
      require(trainFeats.nonEmpty, "no labeled edges with Phase II features")
      val lrModel = EdgeLabeler.train(trainFeats, params.lr)
      val preds = EdgeLabeler.predict(spark,
        allFeats.join(target.select("src", "dst"), Seq("src", "dst")), lrModel)
        .persist(StorageLevel.MEMORY_AND_DISK)
      preds.count()
      preds
    }

    Result(assigns, commFeats, commPreds, commModel, edgePreds,
      Timings(trainingSec, phase1Sec, phase2aSec + phase2bSec, phase3Sec))
  }
}
