package repro.wechat

import repro.{Oracle, SparkSpec}

class SocialGenSpec extends SparkSpec {
  import SocialGen._

  private lazy val cfg = Config(numUsers = 1200, seed = 7)
  private lazy val net = SocialGen.generate(spark, cfg)
  private lazy val edges = net.edges.cache()
  private lazy val users = net.users.cache()

  test("users are exactly numUsers with dense ids") {
    val u = users.collect()
    assert(u.length == cfg.numUsers)
    assert(u.map(_.user).sorted.toSeq == (0 until cfg.numUsers).map(_.toLong))
  }

  test("edges are canonical: src < dst, no duplicates") {
    val e = edges.collect()
    assert(e.forall(r => r.src < r.dst))
    assert(e.map(r => (r.src, r.dst)).distinct.length == e.length)
  }

  test("every edge label is a known first category") {
    val labels = edges.select("label").distinct().collect().map(_.getString(0)).toSet
    assert(labels.subsetOf(RelationType.All.toSet))
  }

  test("first-category ratios approximate the paper's Table I (28/41/15/16)") {
    val total = edges.count().toDouble
    val byLabel = edges.groupBy("label").count().collect()
      .map(r => r.getString(0) -> r.getLong(1) / total).toMap
    assert(math.abs(byLabel(RelationType.Family) - 0.28) < 0.10, byLabel)
    assert(math.abs(byLabel(RelationType.Colleague) - 0.41) < 0.12, byLabel)
    assert(math.abs(byLabel(RelationType.Schoolmate) - 0.15) < 0.08, byLabel)
    assert(math.abs(byLabel(RelationType.Other) - 0.16) < 0.10, byLabel)
  }

  test("colleague edges outnumber schoolmate edges (paper ordering)") {
    val byLabel = edges.groupBy("label").count().collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(byLabel(RelationType.Colleague) > byLabel(RelationType.Schoolmate))
    assert(byLabel(RelationType.Colleague) > byLabel(RelationType.Family))
  }

  test("second categories are consistent with first categories") {
    import spark.implicits._
    val pairs = edges.select("label", "second").distinct().as[(String, String)].collect()
    val valid = Map(
      RelationType.Family -> Set("kin", "in-law", "unknown"),
      RelationType.Colleague -> Set("current", "past", "unknown"),
      RelationType.Schoolmate -> Set("primary", "middle", "university", "unknown"),
      RelationType.Other -> Set("interest", "business", "agent", "unknown"))
    pairs.foreach { case (f, s) => assert(valid(f).contains(s), s"$f/$s") }
  }

  test("interaction sparsity: a large share of pairs has zero interactions") {
    val frac = net.interactions.count().toDouble / edges.count()
    // ~45 % dormant plus per-dim misses → roughly half the pairs silent,
    // mirroring the paper's ~60 % zero-interaction observation
    assert(frac > 0.3 && frac < 0.7, s"interaction coverage $frac")
  }

  test("interaction vectors have 7 non-negative dimensions") {
    val rows = net.interactions.collect()
    assert(rows.nonEmpty)
    rows.foreach { r =>
      assert(r.inter.length == InteractionDims.length)
      assert(r.inter.forall(_ >= 0.0))
      assert(r.inter.exists(_ > 0.0))
    }
  }

  test("interactions reference existing edges") {
    val missing = net.interactions.toDF().join(edges.toDF(), Seq("src", "dst"), "left_anti")
    assert(missing.count() == 0)
  }

  test("family pairs like pictures more than articles on average (Fig. 3 shape)") {
    import spark.implicits._
    val fam = net.interactions.toDF()
      .join(edges.toDF().where($"label" === RelationType.Family), Seq("src", "dst"))
      .select("inter").as[Seq[Double]]
      .collect()
    val likePic = fam.map(_(1)).sum
    val likeArt = fam.map(_(2)).sum
    assert(likePic > likeArt)
  }

  test("schoolmates interact on games more than colleagues do (Fig. 3 shape)") {
    import spark.implicits._
    def gameRate(label: String): Double = {
      val rows = net.interactions.toDF()
        .join(edges.toDF().where($"label" === label), Seq("src", "dst"))
        .select("inter").as[Seq[Double]].collect()
      if (rows.isEmpty) 0.0
      else rows.count(i => i(3) > 0 || i(6) > 0).toDouble / rows.length
    }
    assert(gameRate(RelationType.Schoolmate) > gameRate(RelationType.Colleague))
  }

  test("surveyed fraction approximates the configured rate") {
    val frac = users.where("surveyed").count().toDouble / cfg.numUsers
    assert(math.abs(frac - cfg.surveyedFrac) < 0.06, s"surveyed $frac")
  }

  test("labeled edges are exactly those incident to a surveyed user") {
    import spark.implicits._
    val surveyedSet = users.where("surveyed").select("user").as[Long].collect().toSet
    edges.collect().foreach { e =>
      assert(e.labeled == (surveyedSet(e.src) || surveyedSet(e.dst)))
    }
  }

  test("labeled share lands near the paper's 40% evaluation subgraph") {
    val frac = edges.where("labeled").count().toDouble / edges.count()
    assert(frac > 0.25 && frac < 0.55, s"labeled fraction $frac")
  }

  test("chat groups have >= 2 members drawn from the population") {
    val gs = net.chatGroups.collect()
    assert(gs.nonEmpty)
    gs.foreach { g =>
      assert(g.members.length >= 2)
      assert(g.members.forall(m => m >= 0 && m < cfg.numUsers))
    }
  }

  test("some chat-group names are indicative, most are generic") {
    val names = net.chatGroups.collect().map(_.name)
    val indicative = names.count(n => GroupNameRules.classifyName(n).isDefined)
    assert(indicative > 0)
    assert(indicative.toDouble / names.length < 0.3, s"indicative share ${indicative.toDouble / names.length}")
  }

  test("university circles have tight age cohorts, families are spread") {
    import spark.implicits._
    val ageByUser = users.collect().map(u => u.user -> u.age).toMap
    val circles = net.circles.collect()
    val famSpread = circles.filter(_.ctype == RelationType.Family)
      .groupBy(_.circle).values.map { ms =>
        val ages = ms.map(m => ageByUser(m.user))
        ages.max - ages.min
      }.toSeq
    val schoolSpread = circles.filter(_.ctype == RelationType.Schoolmate)
      .groupBy(_.circle).values.map { ms =>
        val ages = ms.map(m => ageByUser(m.user))
        ages.max - ages.min
      }.toSeq
    assert(schoolSpread.sum.toDouble / schoolSpread.size < famSpread.sum.toDouble / famSpread.size)
  }

  test("generation is deterministic in the seed") {
    val net2 = SocialGen.generate(spark, cfg)
    assert(net2.edges.collect().toSeq == edges.collect().toSeq)
    assert(net2.interactions.count() == net.interactions.count())
  }

  test("different seeds give different networks") {
    val net2 = SocialGen.generate(spark, cfg.copy(seed = 8))
    assert(net2.edges.collect().toSeq != edges.collect().toSeq)
  }

  test("oracle: per-label edge counts match DuckDB") {
    val sparkCounts = edges.groupBy("label").count()
      .withColumnRenamed("count", "cnt")
    Oracle.assertEquivalent(sparkCounts,
      "SELECT label, COUNT(*) AS cnt FROM edges GROUP BY label",
      "edges" -> edges.toDF())
  }

  test("oracle: labeled-edge count by survey flag matches DuckDB") {
    val sparkCounts = edges.groupBy("labeled").count()
      .withColumnRenamed("count", "cnt")
    Oracle.assertEquivalent(sparkCounts,
      "SELECT labeled, COUNT(*) AS cnt FROM edges GROUP BY labeled",
      "edges" -> edges.toDF())
  }

  test("userFeature has the advertised dimensionality") {
    val u = users.head()
    assert(SocialGen.userFeature(u).length == SocialGen.UserFeatureDim)
  }
}
