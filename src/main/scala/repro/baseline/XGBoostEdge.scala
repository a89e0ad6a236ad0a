package repro.baseline

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.ml.GBDT

/** The paper's raw-feature GBDT baseline: "the input feature consists of
  * the individual features of two end users and the interaction feature
  * between them". No community aggregation — most pairs have zero
  * interactions, so this baseline suffers exactly the sparsity the paper
  * highlights (lowest recall in Table IV). */
object XGBoostEdge {

  /** Per-edge raw feature vector: f_src ++ f_dst ++ I_<src,dst>. */
  def features(spark: SparkSession, edgePairs: DataFrame, interactions: DataFrame,
               userFeatures: collection.Map[Long, Array[Double]],
               interDims: Int): DataFrame = {
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(userFeatures)
    val featDim = userFeatures.headOption.map(_._2.length).getOrElse(0)
    val buildUdf = udf((s: Long, d: Long, inter: Seq[Double]) => {
      val zeros = new Array[Double](featDim)
      val fi = if (inter == null) new Array[Double](interDims) else inter.toArray
      bc.value.getOrElse(s, zeros) ++ bc.value.getOrElse(d, zeros) ++ fi
    })
    edgePairs.select("src", "dst")
      .join(interactions.select("src", "dst", "inter"), Seq("src", "dst"), "left")
      .select($"src", $"dst", buildUdf($"src", $"dst", $"inter") as "feats")
  }

  /** Train on `trainEdges` (src, dst, label) and predict for `targets`. */
  def run(spark: SparkSession, interactions: DataFrame,
          userFeatures: collection.Map[Long, Array[Double]],
          trainEdges: DataFrame, targets: DataFrame,
          interDims: Int = 7, params: GBDT.Params = GBDT.Params()): DataFrame = {
    import spark.implicits._
    val trainFeats = features(spark, trainEdges.select("src", "dst"), interactions,
        userFeatures, interDims)
      .join(trainEdges.select("src", "dst", "label"), Seq("src", "dst"))
      .select("feats", "label")
      .as[(Seq[Double], String)]
      .collect()
    val model = GBDT.train(trainFeats.map(_._1.toArray), trainFeats.map(_._2), params)

    val predictUdf = udf((f: Seq[Double]) => model.predictLabel(f.toArray))
    features(spark, targets.select("src", "dst"), interactions, userFeatures, interDims)
      .select($"src", $"dst", predictUdf($"feats") as "pred")
  }
}
