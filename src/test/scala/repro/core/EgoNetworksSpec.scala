package repro.core

import repro.{Oracle, SparkSpec}
import scala.util.Random

class EgoNetworksSpec extends SparkSpec {
  import spark.implicits._

  /** Fig. 7(a): U1 connected to U2..U6, triangle U2-U3-U4, edge U5-U6,
    * bridge U4-U6. */
  private def fig7 = Seq(
    (1L, 2L), (1L, 3L), (1L, 4L), (1L, 5L), (1L, 6L),
    (2L, 3L), (2L, 4L), (3L, 4L), (5L, 6L), (4L, 6L)).toDF("src", "dst")

  private def randomEdges(n: Int, m: Int, seed: Int): Seq[(Long, Long)] = {
    val rng = new Random(seed)
    (0 until m).map { _ =>
      val a = rng.nextInt(n); val b = rng.nextInt(n)
      (math.min(a, b).toLong, math.max(a, b).toLong)
    }.filter(e => e._1 != e._2).distinct
  }

  test("egoMembers contains both directions of every edge") {
    val members = EgoNetworks.egoMembers(spark, fig7).as[(Long, Long)].collect().toSet
    assert(members.contains((1L, 2L)) && members.contains((2L, 1L)))
    assert(members.size == 2 * fig7.count())
  }

  test("ego network of U1 has exactly its five friends") {
    val friends = EgoNetworks.egoMembers(spark, fig7)
      .where($"ego" === 1L).select("friend").as[Long].collect().toSet
    assert(friends == Set(2L, 3L, 4L, 5L, 6L))
  }

  test("ego node is never a member of its own ego network") {
    val bad = EgoNetworks.egoMembers(spark, fig7).where($"ego" === $"friend")
    assert(bad.count() == 0)
  }

  test("inner edges of U1's ego network match Fig. 7(b)") {
    val inner = EgoNetworks.egoInnerEdges(spark, fig7)
      .where($"ego" === 1L).select("a", "b").as[(Long, Long)].collect().toSet
    assert(inner == Set((2L, 3L), (2L, 4L), (3L, 4L), (5L, 6L), (4L, 6L)))
  }

  test("edges incident to the ego are excluded from inner edges") {
    val inner = EgoNetworks.egoInnerEdges(spark, fig7)
      .where($"ego" === 1L).collect()
    inner.foreach(r => assert(r.getLong(1) != 1L && r.getLong(2) != 1L))
  }

  test("inner edges are canonical (a < b)") {
    val rows = EgoNetworks.egoInnerEdges(spark, fig7).collect()
    rows.foreach(r => assert(r.getLong(1) < r.getLong(2)))
  }

  test("each inner edge row corresponds to a triangle") {
    val edgeSet = fig7.as[(Long, Long)].collect().toSet
    EgoNetworks.egoInnerEdges(spark, fig7).as[(Long, Long, Long)].collect().foreach {
      case (ego, a, b) =>
        def has(u: Long, v: Long) = edgeSet((math.min(u, v), math.max(u, v)))
        assert(has(ego, a) && has(ego, b) && has(a, b))
    }
  }

  test("inner-edge total equals 3x the triangle count") {
    // fig7 triangles: (1,2,3),(1,2,4),(1,3,4),(2,3,4),(1,5,6),(1,4,6) → 6
    assert(EgoNetworks.egoInnerEdges(spark, fig7).count() == 18)
  }

  test("matches brute force on a random graph") {
    val edges = randomEdges(30, 120, 5)
    val df = edges.toDF("src", "dst")
    val adj = edges.flatMap(e => Seq(e, e.swap)).groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
    val expected = (for {
      (u, v) <- edges
      w <- adj(u).intersect(adj(v))
    } yield (w, u, v)).toSet
    val got = EgoNetworks.egoInnerEdges(spark, df).as[(Long, Long, Long)].collect().toSet
    assert(got == expected)
  }

  test("oracle: inner edges match a DuckDB 3-way join") {
    val edges = randomEdges(20, 60, 6)
    val df = edges.toDF("src", "dst").cache()
    val sym = EgoNetworks.egoMembers(spark, df)
    val inner = EgoNetworks.egoInnerEdges(spark, df)
    Oracle.assertEquivalent(inner,
      """SELECT s1.ego AS ego, s1.friend AS a, s2.friend AS b
        |FROM sym s1
        |JOIN sym s2 ON s1.ego = s2.ego AND CAST(s1.friend AS BIGINT) < CAST(s2.friend AS BIGINT)
        |JOIN e ON e.src = s1.friend AND e.dst = s2.friend""".stripMargin,
      "sym" -> sym, "e" -> df)
  }

  test("oracle: membership counts per ego equal node degrees") {
    val edges = randomEdges(15, 40, 7)
    val df = edges.toDF("src", "dst")
    val counts = EgoNetworks.egoMembers(spark, df).groupBy("ego").count()
      .withColumnRenamed("count", "deg")
    Oracle.assertEquivalent(counts,
      """SELECT ego, COUNT(*) AS deg FROM (
        |  SELECT src AS ego FROM e UNION ALL SELECT dst AS ego FROM e
        |) GROUP BY ego""".stripMargin,
      "e" -> df)
  }

  test("empty edge set yields empty ego networks") {
    val empty = Seq.empty[(Long, Long)].toDF("src", "dst")
    assert(EgoNetworks.egoMembers(spark, empty).count() == 0)
    assert(EgoNetworks.egoInnerEdges(spark, empty).count() == 0)
  }
}
