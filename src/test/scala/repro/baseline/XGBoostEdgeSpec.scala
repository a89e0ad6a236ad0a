package repro.baseline

import repro.SparkSpec
import repro.wechat.RelationType

class XGBoostEdgeSpec extends SparkSpec {
  import spark.implicits._

  test("feature layout is f_src ++ f_dst ++ inter") {
    val userF: Map[Long, Array[Double]] = Map(1L -> Array(1.0, 10.0), 2L -> Array(2.0, 20.0))
    val inter = Seq((1L, 2L, Seq(7.0, 8.0))).toDF("src", "dst", "inter")
    val pairs = Seq((1L, 2L)).toDF("src", "dst")
    val f = XGBoostEdge.features(spark, pairs, inter, userF, interDims = 2)
      .select("feats").as[Seq[Double]].head()
    assert(f == Seq(1.0, 10.0, 2.0, 20.0, 7.0, 8.0))
  }

  test("missing interactions become zeros") {
    val userF: Map[Long, Array[Double]] = Map(1L -> Array(1.0), 2L -> Array(2.0))
    val inter = Seq.empty[(Long, Long, Seq[Double])].toDF("src", "dst", "inter")
    val f = XGBoostEdge.features(spark, Seq((1L, 2L)).toDF("src", "dst"), inter, userF, 3)
      .select("feats").as[Seq[Double]].head()
    assert(f == Seq(1.0, 2.0, 0.0, 0.0, 0.0))
  }

  test("unknown users get zero individual features") {
    val userF: Map[Long, Array[Double]] = Map(1L -> Array(1.0))
    val inter = Seq.empty[(Long, Long, Seq[Double])].toDF("src", "dst", "inter")
    val f = XGBoostEdge.features(spark, Seq((1L, 9L)).toDF("src", "dst"), inter, userF, 1)
      .select("feats").as[Seq[Double]].head()
    assert(f == Seq(1.0, 0.0, 0.0))
  }

  test("learns interaction-separable classes") {
    val n = 80
    val edges = (0 until n).map(i => (2L * i, 2L * i + 1))
    val inter = edges.zipWithIndex.map { case ((s, d), i) =>
      (s, d, if (i % 2 == 0) Seq(5.0, 0.0) else Seq(0.0, 5.0))
    }
    val labels = edges.zipWithIndex.map { case ((s, d), i) =>
      (s, d, if (i % 2 == 0) RelationType.Colleague else RelationType.Family)
    }
    val userF: Map[Long, Array[Double]] =
      (0 until 2 * n).map(u => u.toLong -> Array(0.5)).toMap
    val preds = XGBoostEdge.run(spark, inter.toDF("src", "dst", "inter"), userF,
      labels.take(50).toDF("src", "dst", "label"),
      edges.drop(50).toDF("src", "dst"), interDims = 2)
      .as[(Long, Long, String)].collect()
    val truth = labels.drop(50).map(l => (l._1, l._2) -> l._3).toMap
    val acc = preds.count(p => truth((p._1, p._2)) == p._3).toDouble / preds.length
    assert(acc > 0.9, s"accuracy $acc")
  }

  test("cannot separate classes whose pairs are interaction-silent (sparsity)") {
    // all interactions empty → features identical → one class dominates
    val n = 40
    val edges = (0 until n).map(i => (2L * i, 2L * i + 1))
    val labels = edges.zipWithIndex.map { case ((s, d), i) =>
      (s, d, if (i % 2 == 0) RelationType.Colleague else RelationType.Family)
    }
    val userF: Map[Long, Array[Double]] =
      (0 until 2 * n).map(u => u.toLong -> Array(0.5)).toMap
    val preds = XGBoostEdge.run(spark,
      Seq.empty[(Long, Long, Seq[Double])].toDF("src", "dst", "inter"), userF,
      labels.take(20).toDF("src", "dst", "label"),
      edges.drop(20).toDF("src", "dst"), interDims = 2)
      .as[(Long, Long, String)].collect()
    assert(preds.map(_._3).distinct.length == 1)
  }

  test("every target receives one prediction") {
    val edges = (0 until 10).map(i => (2L * i, 2L * i + 1))
    val labels = edges.map { case (s, d) => (s, d, RelationType.Family) }
    val userF: Map[Long, Array[Double]] = (0 until 20).map(u => u.toLong -> Array(1.0)).toMap
    val preds = XGBoostEdge.run(spark,
      Seq.empty[(Long, Long, Seq[Double])].toDF("src", "dst", "inter"), userF,
      labels.take(5).toDF("src", "dst", "label"),
      edges.drop(5).toDF("src", "dst"), interDims = 2)
    assert(preds.count() == 5)
  }
}
