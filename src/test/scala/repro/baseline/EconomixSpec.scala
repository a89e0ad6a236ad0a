package repro.baseline

import repro.SparkSpec
import repro.wechat.RelationType

class EconomixSpec extends SparkSpec {
  import spark.implicits._

  test("bucket maps counts to log2 buckets") {
    assert(Economix.bucket(1.0, 4) == 0)
    assert(Economix.bucket(2.0, 4) == 1)
    assert(Economix.bucket(3.0, 4) == 1)
    assert(Economix.bucket(4.0, 4) == 2)
    assert(Economix.bucket(7.9, 4) == 2)
    assert(Economix.bucket(8.0, 4) == 3)
    assert(Economix.bucket(1000.0, 4) == 3)
  }

  /** Edges whose interaction "words" perfectly encode their class. */
  private def data(n: Int): (Seq[(Long, Long)], Seq[(Long, Long, Seq[Double])], Seq[(Long, Long, String)]) = {
    val edges = (0 until n).map(i => (2L * i, 2L * i + 1))
    val inter = edges.zipWithIndex.map { case ((s, d), i) =>
      val v = Array.fill(4)(0.0)
      v(i % 2) = 5.0 // word pattern distinguishes the two classes
      (s, d, v.toSeq)
    }
    val labels = edges.zipWithIndex.map { case ((s, d), i) =>
      (s, d, if (i % 2 == 0) RelationType.Colleague else RelationType.Family)
    }
    (edges, inter, labels)
  }

  test("classifies edges whose interaction words encode the class") {
    val (edges, inter, labels) = data(60)
    val edgesDf = edges.toDF("src", "dst")
    val interDf = inter.toDF("src", "dst", "inter")
    val train = labels.take(40).toDF("src", "dst", "label")
    val targets = edges.drop(40).toDF("src", "dst")
    val truth = labels.drop(40).map(l => (l._1, l._2) -> l._3).toMap
    val preds = Economix.run(spark, edgesDf, interDf, train, targets,
      Economix.Params(smoothIters = 0))
      .as[(Long, Long, String)].collect()
    val acc = preds.count(p => truth((p._1, p._2)) == p._3).toDouble / preds.length
    assert(acc > 0.85, s"accuracy $acc")
  }

  test("every target gets a prediction row") {
    val (edges, inter, labels) = data(20)
    val preds = Economix.run(spark, edges.toDF("src", "dst"),
      inter.toDF("src", "dst", "inter"),
      labels.take(10).toDF("src", "dst", "label"),
      edges.drop(10).toDF("src", "dst"))
    assert(preds.count() == 10)
  }

  test("targets missing from the edge list yield unknown") {
    val (edges, inter, labels) = data(10)
    val preds = Economix.run(spark, edges.toDF("src", "dst"),
      inter.toDF("src", "dst", "inter"),
      labels.toDF("src", "dst", "label"),
      Seq((999L, 1000L)).toDF("src", "dst"))
      .as[(Long, Long, String)].collect()
    assert(preds.head._3 == RelationType.Unknown)
  }

  test("structural smoothing propagates labels to silent edges") {
    // chain: edges around node 0 share its latent neighborhood; a silent
    // edge (no words) adjacent to loud colleague edges leans colleague
    val edges = Seq((0L, 1L), (0L, 2L), (0L, 3L), (10L, 11L), (10L, 12L), (10L, 13L))
    val inter = Seq(
      (0L, 1L, Seq(5.0, 0.0, 0.0, 0.0)), (0L, 2L, Seq(5.0, 0.0, 0.0, 0.0)),
      (10L, 11L, Seq(0.0, 0.0, 5.0, 0.0)), (10L, 12L, Seq(0.0, 0.0, 5.0, 0.0)))
    val train = Seq(
      (0L, 1L, RelationType.Colleague), (0L, 2L, RelationType.Colleague),
      (10L, 11L, RelationType.Family), (10L, 12L, RelationType.Family))
    val targets = Seq((0L, 3L), (10L, 13L))
    val preds = Economix.run(spark, edges.toDF("src", "dst"),
      inter.toDF("src", "dst", "inter"), train.toDF("src", "dst", "label"),
      targets.toDF("src", "dst"),
      Economix.Params(smoothIters = 3, smoothAlpha = 0.7))
      .as[(Long, Long, String)].collect().map(p => (p._1, p._2) -> p._3).toMap
    assert(preds((0L, 3L)) == RelationType.Colleague)
    assert(preds((10L, 13L)) == RelationType.Family)
  }

  test("deterministic in the seed") {
    val (edges, inter, labels) = data(20)
    def once() = Economix.run(spark, edges.toDF("src", "dst"),
      inter.toDF("src", "dst", "inter"), labels.take(10).toDF("src", "dst", "label"),
      edges.drop(10).toDF("src", "dst")).collect().sortBy(_.getLong(0)).toSeq
    assert(once() == once())
  }
}
