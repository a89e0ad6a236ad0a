package repro.core

import repro.SparkSpec
import repro.ml.LogisticRegression

class EdgeLabelerSpec extends SparkSpec {
  import spark.implicits._

  // edge (1,2): in 2's ego net, node 1 is in comm 0 (tightness .8);
  //             in 1's ego net, node 2 is in comm 1 (tightness .6)
  private def assigns = spark.createDataset(Seq(
    EgoAssign(ego = 2L, friend = 1L, comm = 0, tightness = 0.8, commSize = 3),
    EgoAssign(ego = 1L, friend = 2L, comm = 1, tightness = 0.6, commSize = 4)))

  private def preds = spark.createDataset(Seq(
    CommPred(ego = 2L, comm = 0, probs = Array(0.7, 0.2, 0.1), pred = "colleague"),
    CommPred(ego = 1L, comm = 1, probs = Array(0.1, 0.8, 0.1), pred = "family")))

  private def edge = Seq((1L, 2L)).toDF("src", "dst")

  test("Eq. 4 feature layout: [t_u, t_v, r^{C_u}, r^{C_v}]") {
    val f = EdgeLabeler.features(spark, edge, assigns, preds)
      .select("feats").as[Seq[Double]].head()
    assert(f == Seq(0.8, 0.6, 0.7, 0.2, 0.1, 0.1, 0.8, 0.1))
  }

  test("feature vector length is 2 + 2*|L|") {
    val f = EdgeLabeler.features(spark, edge, assigns, preds)
      .select("feats").as[Seq[Double]].head()
    assert(f.length == 2 + 2 * 3)
  }

  test("edges without assignments on one side are dropped") {
    val edges = Seq((1L, 2L), (5L, 6L)).toDF("src", "dst")
    val feats = EdgeLabeler.features(spark, edges, assigns, preds)
    assert(feats.count() == 1)
  }

  test("features join the correct ego direction") {
    // Reverse case: edge (2,3) has no (ego=3, friend=2) assignment → dropped
    val edges = Seq((2L, 3L)).toDF("src", "dst")
    assert(EdgeLabeler.features(spark, edges, assigns, preds).count() == 0)
  }

  test("train + predict recovers a linearly separable rule") {
    // two classes determined by whether the first community prob leans to
    // colleague or family; mimic many edges
    val rng = new scala.util.Random(3)
    val rows = (0 until 200).map { i =>
      val colleague = i % 2 == 0
      val pu = if (colleague) Array(0.8 + rng.nextGaussian() * 0.05, 0.1, 0.1)
               else Array(0.1, 0.8 + rng.nextGaussian() * 0.05, 0.1)
      val feats = Array(0.5, 0.5) ++ pu ++ pu
      (feats, if (colleague) "colleague" else "family")
    }
    val model = EdgeLabeler.train(rows)
    val acc = rows.count { case (f, l) => model.predictLabel(f) == l }.toDouble / rows.size
    assert(acc > 0.95)
  }

  test("predict applies the model distributed over the feature frame") {
    val rows = (0 until 100).map { i =>
      val colleague = i % 2 == 0
      val pu = if (colleague) Array(0.9, 0.05, 0.05) else Array(0.05, 0.9, 0.05)
      (Array(0.5, 0.5) ++ pu ++ pu, if (colleague) "colleague" else "family")
    }
    val model = EdgeLabeler.train(rows)
    val featsDf = Seq(
      (1L, 2L, Seq(0.5, 0.5, 0.9, 0.05, 0.05, 0.9, 0.05, 0.05)),
      (3L, 4L, Seq(0.5, 0.5, 0.05, 0.9, 0.05, 0.05, 0.9, 0.05)))
      .toDF("src", "dst", "feats")
    val out = EdgeLabeler.predict(spark, featsDf, model)
      .as[(Long, Long, String)].collect().sortBy(_._1)
    assert(out(0)._3 == "colleague")
    assert(out(1)._3 == "family")
  }

  test("feature computation is symmetric in canonical edge order") {
    // same pair, same assignments: result must not depend on join order
    val f1 = EdgeLabeler.features(spark, edge, assigns, preds)
      .select("feats").as[Seq[Double]].head()
    val f2 = EdgeLabeler.features(spark, edge, assigns, preds)
      .select("feats").as[Seq[Double]].head()
    assert(f1 == f2)
  }

  test("train throws on empty input") {
    intercept[IllegalArgumentException] {
      EdgeLabeler.train(Seq.empty)
    }
  }

  test("LR over Eq. 4 features separates agreeing communities cleanly") {
    // if both communities agree on a type, LR should predict that type
    val rows = Seq("colleague", "family", "schoolmate").zipWithIndex.flatMap {
      case (cls, idx) =>
        (0 until 40).map { _ =>
          val p = Array(0.05, 0.05, 0.05)
          p(idx) = 0.9
          (Array(0.7, 0.7) ++ p ++ p, cls)
        }
    }
    val model = EdgeLabeler.train(rows,
      LogisticRegression.Params(epochs = 400))
    Seq(0, 1, 2).foreach { idx =>
      val p = Array(0.05, 0.05, 0.05); p(idx) = 0.9
      val pred = model.predictLabel(Array(0.7, 0.7) ++ p ++ p)
      assert(pred == Seq("colleague", "family", "schoolmate")(idx))
    }
  }
}
