package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.ml.{CommCNN, GBDT}

/** Phase II classification result for one local community: softmax vector
  * r^C over [[repro.wechat.RelationType.Major]] (sorted order). */
final case class CommPred(ego: Long, comm: Int, probs: Array[Double], pred: String)

/** A trained community classification model — either the XGBoost-style
  * mean/std pooling variant (LoCEC-XGB) or CommCNN (LoCEC-CNN). */
sealed trait CommModel extends Serializable {
  def classes: Array[String]
  def predictProba(cf: CommFeat): Array[Double]
  /** A copy safe to use from one Spark task thread (CNN layers cache
    * forward state; GBDT/LR are immutable). */
  def threadSafeCopy: CommModel
}

/** LoCEC-XGB: mean and standard deviation of each feature dimension over
  * the community's (top-k) members, fed to the GBDT. */
final class XgbCommModel(val model: GBDT.Model) extends CommModel {
  def classes: Array[String] = model.classes
  def predictProba(cf: CommFeat): Array[Double] =
    model.predictProba(CommunityClassifier.meanStdVector(cf))
  def threadSafeCopy: CommModel = this
}

/** LoCEC-CNN: the full tightness-ordered feature matrix through CommCNN. */
final class CnnCommModel(val model: CommCNN.Model) extends CommModel {
  def classes: Array[String] = model.classes
  def predictProba(cf: CommFeat): Array[Double] = model.predictProba(cf.matrix)
  def threadSafeCopy: CommModel = new CnnCommModel(model.copyModel)
}

/** Training (driver-side — labeled communities are few, as in the paper)
  * and distributed classification of local communities. */
object CommunityClassifier {

  /** [mean_j..., std_j...] over the matrix's real (non-padded) rows; a
    * community classified "by computing the mean and standard deviation of
    * each feature dimension" (Sec. IV-B-2). */
  def meanStdVector(cf: CommFeat): Array[Double] = {
    val rows = math.max(cf.realRows, 1)
    val d = cf.cols
    val mean = new Array[Double](d)
    val std = new Array[Double](d)
    var i = 0
    while (i < rows) {
      var j = 0
      while (j < d) { mean(j) += cf.flat(i * d + j); j += 1 }
      i += 1
    }
    var j = 0
    while (j < d) { mean(j) /= rows; j += 1 }
    i = 0
    while (i < rows) {
      var j2 = 0
      while (j2 < d) { val v = cf.flat(i * d + j2) - mean(j2); std(j2) += v * v; j2 += 1 }
      i += 1
    }
    j = 0
    while (j < d) { std(j) = math.sqrt(std(j) / rows); j += 1 }
    mean ++ std
  }

  /** Train the LoCEC-XGB community model on labeled communities. */
  def trainXgb(samples: Seq[(CommFeat, String)],
               params: GBDT.Params = GBDT.Params()): XgbCommModel = {
    val x = samples.map(s => meanStdVector(s._1)).toArray
    val y = samples.map(_._2).toArray
    new XgbCommModel(GBDT.train(x, y, params))
  }

  /** Train the LoCEC-CNN community model on labeled communities. */
  def trainCnn(samples: Seq[(CommFeat, String)],
               cfg: CommCNN.Config = CommCNN.Config()): CnnCommModel = {
    val classes = samples.map(_._2).distinct.sorted.toArray
    val classIdx = classes.zipWithIndex.toMap
    val mats = samples.map(_._1.matrix).toArray
    val labels = samples.map(s => classIdx(s._2)).toArray
    val first = samples.head._1
    new CnnCommModel(CommCNN.train(mats, labels, classes,
      cfg.copy(k = first.rows, d = first.cols, numClasses = classes.length)))
  }

  /** Distributed classification: the (small) model ships inside the task
    * closure; each partition takes a thread-confined copy. */
  def classify(spark: SparkSession, commFeats: Dataset[CommFeat],
               model: CommModel): Dataset[CommPred] = {
    import spark.implicits._
    commFeats.mapPartitions { iter =>
      val m = model.threadSafeCopy
      iter.map { cf =>
        val p = m.predictProba(cf)
        CommPred(cf.ego, cf.comm, p, m.classes(p.indexOf(p.max)))
      }
    }
  }
}
