package repro.baseline

import repro.SparkSpec
import repro.wechat.RelationType

class ProbWPSpec extends SparkSpec {
  import spark.implicits._

  /** Two 5-cliques (0-4 colleague, 5-9 family) joined by one bridge. */
  private def cliqueEdges: Seq[(Long, Long, String)] = {
    def clique(off: Int, label: String) =
      for { i <- 0 until 5; j <- i + 1 until 5 }
        yield ((off + i).toLong, (off + j).toLong, label)
    clique(0, RelationType.Colleague) ++ clique(5, RelationType.Family) ++
      Seq((0L, 5L, RelationType.Other))
  }

  test("edges inside a labeled clique get the clique's label") {
    val all = cliqueEdges
    val edges = all.map(e => (e._1, e._2)).toDF("src", "dst")
    // hide (1,2) and (6,7); train on the rest
    val hidden = Set((1L, 2L), (6L, 7L))
    val train = all.filterNot(e => hidden((e._1, e._2))).toDF("src", "dst", "label")
    val targets = hidden.toSeq.toDF("src", "dst")
    val preds = ProbWP.run(spark, edges, train, targets)
      .as[(Long, Long, String)].collect().map(p => (p._1, p._2) -> p._3).toMap
    assert(preds((1L, 2L)) == RelationType.Colleague)
    assert(preds((6L, 7L)) == RelationType.Family)
  }

  test("abstains with unknown when no labeled edge connects the similar sets") {
    val edges = Seq((1L, 2L), (3L, 4L)).toDF("src", "dst")
    val train = Seq.empty[(Long, Long, String)].toDF("src", "dst", "label")
    val preds = ProbWP.run(spark, edges, train, Seq((1L, 2L)).toDF("src", "dst"))
      .as[(Long, Long, String)].collect()
    assert(preds.head._3 == RelationType.Unknown)
  }

  test("every target receives exactly one row") {
    val all = cliqueEdges
    val edges = all.map(e => (e._1, e._2)).toDF("src", "dst")
    val train = all.take(15).toDF("src", "dst", "label")
    val targets = all.drop(15).map(e => (e._1, e._2)).toDF("src", "dst")
    val preds = ProbWP.run(spark, edges, train, targets).collect()
    assert(preds.length == targets.count())
    assert(preds.map(r => (r.getLong(0), r.getLong(1))).distinct.length == preds.length)
  }

  test("accuracy collapses when almost no labels are available") {
    val all = cliqueEdges
    val edges = all.map(e => (e._1, e._2)).toDF("src", "dst")
    val train = all.take(1).toDF("src", "dst", "label") // 1 labeled edge
    val targets = all.drop(1).map(e => (e._1, e._2)).toDF("src", "dst")
    val preds = ProbWP.run(spark, edges, train, targets, ProbWP.Params(topK = 2))
      .as[(Long, Long, String)].collect()
    val unknown = preds.count(_._3 == RelationType.Unknown)
    assert(unknown > preds.length / 2, s"only $unknown/${preds.length} abstained")
  }

  test("deterministic across runs") {
    val all = cliqueEdges
    val edges = all.map(e => (e._1, e._2)).toDF("src", "dst")
    val train = all.take(15).toDF("src", "dst", "label")
    val targets = all.drop(15).map(e => (e._1, e._2)).toDF("src", "dst")
    val a = ProbWP.run(spark, edges, train, targets).collect().sortBy(_.getLong(0)).toSeq
    val b = ProbWP.run(spark, edges, train, targets).collect().sortBy(_.getLong(0)).toSeq
    assert(a == b)
  }
}
