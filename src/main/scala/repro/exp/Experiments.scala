package repro.exp

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.baseline.{Economix, ProbWP, XGBoostEdge}
import repro.core._
import repro.ml.{CommCNN, GBDT, LogisticRegression, Metrics}
import repro.wechat.{GroupNameRules, RelationType, SocialGen}

/** Harnesses reproducing each table of the paper's evaluation section.
  * Shared by the spark-submit entrypoints in jobs/ and the bench suites. */
object Experiments {

  /** A generated evaluation setup: the network plus the labeled-edge
    * train/test split used by Tables IV–VI.
    *
    * The paper's effectiveness study extracts a sub-graph where ~40 % of
    * edges carry survey labels and splits those 80/20; our surveyed-user
    * fraction is calibrated so labeled major-type edges are ~40 % of all
    * edges, and the 80/20 split is a deterministic hash split.
    */
  final case class Setup(net: SocialGen.Network, edges: DataFrame,
                         interactions: DataFrame,
                         userFeatures: collection.Map[Long, Array[Double]],
                         trainEdges: DataFrame, testEdges: DataFrame)

  def setup(spark: SparkSession, numUsers: Int, seed: Long = 42): Setup = {
    import spark.implicits._
    val net = SocialGen.generate(spark, SocialGen.Config(numUsers = numUsers, seed = seed))
    val edges = net.edges.toDF().cache()
    val interactions = net.interactions.toDF().cache()
    val userFeatures: collection.Map[Long, Array[Double]] =
      net.users.collect().map(u => u.user -> SocialGen.userFeature(u)).toMap

    val labeledMajor = edges
      .where($"labeled" && $"label".isin(RelationType.Major: _*))
      .select("src", "dst", "label")
    val withBucket = labeledMajor
      .withColumn("bucket", pmod(xxhash64($"src", $"dst", lit(seed)), lit(10)))
    val trainEdges = withBucket.where($"bucket" < 8).drop("bucket").cache()
    val testEdges = withBucket.where($"bucket" >= 8).drop("bucket").cache()
    Setup(net, edges, interactions, userFeatures, trainEdges, testEdges)
  }

  /** Join predictions (src, dst, pred) with the ground truth of `truth`
    * (src, dst, label) and score. Missing predictions count as "unknown"
    * (they cost recall, as in the paper's abstaining baselines). */
  def evaluate(spark: SparkSession, preds: DataFrame, truth: DataFrame): Seq[Metrics.Score] = {
    import spark.implicits._
    val joined = truth.select("src", "dst", "label")
      .join(preds.select("src", "dst", "pred"), Seq("src", "dst"), "left")
      .select($"label", coalesce($"pred", lit(RelationType.Unknown)) as "pred")
      .as[(String, String)]
      .collect()
    Metrics.report(joined.map(_._1).toSeq, joined.map(_._2).toSeq)
  }

  // ------------------------------------------------------------------ I --
  final case class TypeRatio(first: String, firstRatio: Double,
                             second: String, secondRatio: Double)

  /** Table I: distribution of relationship types among survey-labeled
    * edges — first-category ratios and global second-category ratios. */
  def tableI(spark: SparkSession, numUsers: Int, seed: Long = 42): Seq[TypeRatio] = {
    import spark.implicits._
    val net = SocialGen.generate(spark, SocialGen.Config(numUsers = numUsers, seed = seed))
    val labeled = net.edges.where($"labeled")
    val total = labeled.count().toDouble
    val firsts = labeled.groupBy("label").count().as[(String, Long)].collect().toMap
    val seconds = labeled.groupBy("label", "second").count()
      .as[(String, String, Long)].collect()
    seconds.sortBy { case (f, s, _) => (RelationType.priority(f), s) }.map {
      case (f, s, c) => TypeRatio(f, firsts(f) / total, s, c / total)
    }.toSeq
  }

  // ----------------------------------------------------------------- II --
  /** Table II: rule-based group-name classification over all major-type
    * edges (high precision, tiny recall). */
  def tableII(spark: SparkSession, st: Setup): Seq[Metrics.Score] = {
    import spark.implicits._
    val majorEdges = st.edges.where($"label".isin(RelationType.Major: _*))
    val preds = GroupNameRules.predict(spark, st.net.chatGroups.toDF(), st.edges)
    evaluate(spark, preds, majorEdges.select("src", "dst", "label"))
  }

  // ----------------------------------------------------------------- IV --
  /** Knobs sized for bench scale; unit tests shrink them further. */
  final case class ModelSizes(gbdt: GBDT.Params = GBDT.Params(),
                              cnn: CommCNN.Config = CommCNN.Config(epochs = 25),
                              lr: LogisticRegression.Params = LogisticRegression.Params(),
                              maxTrainCommunities: Int = 8000)

  /** Table IV: edge classification P/R/F1 for the five algorithms. Returns
    * algorithm → per-class scores + overall (in insertion order). */
  def tableIV(spark: SparkSession, st: Setup,
              sizes: ModelSizes = ModelSizes(),
              algorithms: Seq[String] = Seq("ProbWP", "Economix", "XGBoost",
                                            "LoCEC-XGB", "LoCEC-CNN"),
              precomputed: Option[LoCEC.Precomputed] = None)
      : Seq[(String, Seq[Metrics.Score])] = {
    val targets = st.testEdges.select("src", "dst")
    var pre: Option[LoCEC.Precomputed] = precomputed

    def runLoCEC(variant: LoCEC.Variant): DataFrame = {
      val res = LoCEC.run(spark, st.edges, st.interactions, st.userFeatures,
        st.trainEdges,
        LoCEC.Params(variant = variant, gbdt = sizes.gbdt, cnn = sizes.cnn,
          lr = sizes.lr, maxTrainCommunities = sizes.maxTrainCommunities),
        predictEdges = Some(targets), precomputed = pre)
      pre = Some(LoCEC.Precomputed(res.assigns, res.commFeats))
      res.edgePreds
    }

    algorithms.map { algo =>
      val preds = algo match {
        case "ProbWP"    => ProbWP.run(spark, st.edges, st.trainEdges, targets)
        case "Economix"  => Economix.run(spark, st.edges, st.interactions, st.trainEdges, targets)
        case "XGBoost"   => XGBoostEdge.run(spark, st.interactions, st.userFeatures,
                                            st.trainEdges, targets, params = sizes.gbdt)
        case "LoCEC-XGB" => runLoCEC(LoCEC.Xgb)
        case "LoCEC-CNN" => runLoCEC(LoCEC.Cnn)
        case other       => throw new IllegalArgumentException(s"unknown algorithm $other")
      }
      algo -> evaluate(spark, preds, st.testEdges)
    }
  }

  // ------------------------------------------------------------------ V --
  /** Table V: local community classification P/R/F1 for LoCEC-XGB and
    * LoCEC-CNN. Communities are labeled by the majority type of their
    * labeled ego–member edges (all survey labels, as in Sec. V-C) and
    * split 80/20. */
  def tableV(spark: SparkSession, st: Setup,
             sizes: ModelSizes = ModelSizes(), seed: Long = 42,
             precomputed: Option[LoCEC.Precomputed] = None)
      : Seq[(String, Seq[Metrics.Score])] = {
    import spark.implicits._
    val commFeats = precomputed.map(_.commFeats).getOrElse {
      val inner = EgoNetworks.egoInnerEdges(spark, st.edges).cache()
      val assigns = LocalCommunities.detect(spark, st.edges).cache()
      CommunityFeatures.compute(spark, assigns, inner, st.interactions,
        st.userFeatures, k = 20, interDims = 7, featDims = 2).cache()
    }

    val labeledAll = st.edges
      .where($"labeled" && $"label".isin(RelationType.Major: _*))
      .select("src", "dst", "label")
    val labels = CommunityFeatures.labels(spark, commFeats, labeledAll).as[LabeledComm]
    val samples = commFeats
      .joinWith(labels, commFeats("ego") === labels("ego") && commFeats("comm") === labels("comm"))
      .orderBy(col("_1.ego"), col("_1.comm"))
      .take(sizes.maxTrainCommunities * 2)
      .map { case (cf, lc) => (cf, lc.label) }
      .toSeq
    val (train, test) = samples.partition { case (cf, _) =>
      math.floorMod(scala.util.hashing.MurmurHash3.productHash((cf.ego, cf.comm, seed)), 10) < 8
    }
    require(train.nonEmpty && test.nonEmpty, "empty community split")

    val xgb = CommunityClassifier.trainXgb(train, sizes.gbdt)
    val cnn = CommunityClassifier.trainCnn(train, sizes.cnn)
    Seq(
      "LoCEC-XGB" -> Metrics.report(test.map(_._2),
        test.map { case (cf, _) => val p = xgb.predictProba(cf); xgb.classes(p.indexOf(p.max)) }),
      "LoCEC-CNN" -> Metrics.report(test.map(_._2),
        test.map { case (cf, _) => val p = cnn.predictProba(cf); cnn.classes(p.indexOf(p.max)) }))
  }

  // ----------------------------------------------------------------- VI --
  /** Table VI: per-phase running time of LoCEC-CNN over the whole network
    * (all edges labeled in Phase III). Paper reports hours on 100 servers;
    * we report seconds on local[*] and compare the per-phase shape. */
  def tableVI(spark: SparkSession, st: Setup,
              sizes: ModelSizes = ModelSizes()): LoCEC.Timings = {
    LoCEC.run(spark, st.edges, st.interactions, st.userFeatures, st.trainEdges,
      LoCEC.Params(variant = LoCEC.Cnn, gbdt = sizes.gbdt, cnn = sizes.cnn,
        lr = sizes.lr, maxTrainCommunities = sizes.maxTrainCommunities)).timings
  }

  // ------------------------------------------------------------ helpers --
  def formatScores(algo: String, scores: Seq[Metrics.Score]): String =
    scores.map(s => f"| $algo%-10s | ${s.label}%-12s | ${s.precision}%.3f | ${s.recall}%.3f | ${s.f1}%.3f |")
      .mkString("\n")
}
