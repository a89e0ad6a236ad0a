package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.ml.LogisticRegression

/** Phase III (Sec. IV-C): combine the two local-community classification
  * results of an edge's endpoints into its final relationship type with a
  * multinomial logistic regression over the Eq. 4 feature vector
  *
  *   f_<u,v> = [tightness(u, C_u), tightness(v, C_v), r^{C_u}, r^{C_v}]
  *
  * where C_u is u's local community in v's ego network and vice versa.
  */
object EdgeLabeler {

  /** Eq. 4 feature vectors for the given (src, dst) edges (canonical
    * src < dst). Edges whose endpoints lack an assignment (degree-0 side —
    * impossible for real edges) are dropped. */
  def features(spark: SparkSession, edges: DataFrame,
               assigns: Dataset[EgoAssign], preds: Dataset[CommPred]): DataFrame = {
    import spark.implicits._
    val a = assigns.toDF()
    val p = preds.toDF()

    // C_u = src's community inside dst's ego network
    val srcSide = edges.select("src", "dst")
      .join(a.select($"ego", $"friend", $"comm", $"tightness"),
            $"ego" === $"dst" && $"friend" === $"src")
      .select($"src", $"dst", $"ego" as "egoU", $"comm" as "commU", $"tightness" as "tu")
      .join(p.select($"ego" as "egoU", $"comm" as "commU", $"probs" as "pu"),
            Seq("egoU", "commU"))
      .select("src", "dst", "tu", "pu")

    // C_v = dst's community inside src's ego network
    val dstSide = edges.select("src", "dst")
      .join(a.select($"ego", $"friend", $"comm", $"tightness"),
            $"ego" === $"src" && $"friend" === $"dst")
      .select($"src", $"dst", $"ego" as "egoV", $"comm" as "commV", $"tightness" as "tv")
      .join(p.select($"ego" as "egoV", $"comm" as "commV", $"probs" as "pv"),
            Seq("egoV", "commV"))
      .select("src", "dst", "tv", "pv")

    srcSide.join(dstSide, Seq("src", "dst"))
      .select($"src", $"dst",
        concat(array($"tu", $"tv"), $"pu", $"pv") as "feats")
  }

  /** Train the Phase III LR on labeled edges.
    * @param labeledFeats (src, dst, feats, label) — collected to the driver;
    *        the labeled set is small (0.02 % of edges in the paper). */
  def train(labeledFeats: Seq[(Array[Double], String)],
            params: LogisticRegression.Params = LogisticRegression.Params()): LogisticRegression.Model =
    LogisticRegression.train(labeledFeats.map(_._1).toArray,
                             labeledFeats.map(_._2).toArray, params)

  /** Distributed prediction over the Eq. 4 features. */
  def predict(spark: SparkSession, feats: DataFrame,
              model: LogisticRegression.Model): DataFrame = {
    import spark.implicits._
    val predictUdf = udf((f: Seq[Double]) => model.predictLabel(f.toArray))
    feats.select($"src", $"dst", predictUdf($"feats") as "pred")
  }
}
