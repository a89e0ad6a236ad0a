package repro.exp

import repro.SparkSpec
import repro.wechat.RelationType

class ExperimentsSpec extends SparkSpec {
  import spark.implicits._

  private lazy val st = Experiments.setup(spark, numUsers = 500, seed = 3)

  test("setup splits labeled major edges roughly 80/20") {
    val tr = st.trainEdges.count().toDouble
    val te = st.testEdges.count().toDouble
    val frac = tr / (tr + te)
    assert(frac > 0.72 && frac < 0.88, s"train fraction $frac")
  }

  test("train and test sets are disjoint and major-typed") {
    assert(st.trainEdges.join(st.testEdges, Seq("src", "dst")).count() == 0)
    val labels = st.trainEdges.union(st.testEdges).select("label").distinct()
      .as[String].collect().toSet
    assert(labels.subsetOf(RelationType.Major.toSet))
  }

  test("split is deterministic in the seed") {
    val st2 = Experiments.setup(spark, numUsers = 500, seed = 3)
    assert(st2.trainEdges.collect().toSet == st.trainEdges.collect().toSet)
  }

  test("evaluate scores a perfect predictor at 1.0") {
    val preds = st.testEdges.select($"src", $"dst", $"label" as "pred")
    val scores = Experiments.evaluate(spark, preds, st.testEdges)
    assert(scores.last.f1 == 1.0)
  }

  test("evaluate treats missing predictions as unknown (recall loss)") {
    val preds = st.testEdges.limit(0).select($"src", $"dst", $"label" as "pred")
    val scores = Experiments.evaluate(spark, preds, st.testEdges)
    assert(scores.last.recall == 0.0)
  }

  test("tableI ratios are consistent") {
    val rows = Experiments.tableI(spark, numUsers = 500, seed = 3)
    // global second-category ratios partition the labeled edges
    assert(math.abs(rows.map(_.secondRatio).sum - 1.0) < 1e-9)
    // first-category ratios partition them too (each first appears once)
    val firsts = rows.map(r => r.first -> r.firstRatio).toMap
    assert(math.abs(firsts.values.sum - 1.0) < 1e-9)
    firsts.values.foreach(v => assert(v > 0 && v < 1))
    // second ratios of a first category sum to that category's first ratio
    rows.groupBy(_.first).foreach { case (f, rs) =>
      assert(math.abs(rs.map(_.secondRatio).sum - firsts(f)) < 1e-9)
    }
  }

  test("tableI covers all four first categories") {
    val rows = Experiments.tableI(spark, numUsers = 500, seed = 3)
    assert(rows.map(_.first).toSet == RelationType.All.toSet)
  }

  test("tableII reports high precision and low recall for covered types") {
    val scores = Experiments.tableII(spark, st)
    val overall = scores.last
    assert(overall.recall < 0.2, s"recall ${overall.recall}")
    // precision over predicted edges should be well above chance whenever
    // any prediction was made
    val perClass = scores.dropRight(1)
    assert(perClass.exists(_.precision > 0.5) || perClass.forall(_.precision == 0.0))
  }

  test("formatScores renders one row per score") {
    val scores = Experiments.evaluate(spark,
      st.testEdges.select($"src", $"dst", $"label" as "pred"), st.testEdges)
    val rendered = Experiments.formatScores("X", scores)
    assert(rendered.linesIterator.size == scores.size)
  }
}
