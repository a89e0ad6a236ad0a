package repro.wechat

import repro.SparkSpec

class GroupNameRulesSpec extends SparkSpec {
  import spark.implicits._

  test("classifyName matches family patterns") {
    assert(GroupNameRules.classifyName("Zhang Family Group").contains(RelationType.Family))
  }

  test("classifyName matches colleague patterns") {
    assert(GroupNameRules.classifyName("Acme Corp Dept 3").contains(RelationType.Colleague))
    assert(GroupNameRules.classifyName("Initech Company").contains(RelationType.Colleague))
  }

  test("classifyName matches school patterns") {
    assert(GroupNameRules.classifyName("Class 3 of Sunshine School").contains(RelationType.Schoolmate))
  }

  test("classifyName is case-insensitive") {
    assert(GroupNameRules.classifyName("WANG FAMILY group").contains(RelationType.Family))
  }

  test("generic names yield no classification") {
    assert(GroupNameRules.classifyName("Happy Friends 42").isEmpty)
    assert(GroupNameRules.classifyName("Trip 2019").isEmpty)
  }

  test("school pattern wins over colleague mention") {
    // a class group chat of a corporate training school-like name: school
    // indicators are checked first (they are the most precise in Table II)
    assert(GroupNameRules.classifyName("Class 1 of Acme Corp School")
      .contains(RelationType.Schoolmate))
  }

  private def groupsDf(rows: Seq[(Long, String, String, Seq[Long])]) =
    rows.toDF("gid", "name", "gtype", "members")

  private def edgesDf(rows: Seq[(Long, Long)]) = rows.toDF("src", "dst")

  test("predict labels member pairs of an indicative group that are edges") {
    val groups = groupsDf(Seq((1L, "Li Family Group", "family", Seq(1L, 2L, 3L))))
    val edges = edgesDf(Seq((1L, 2L), (2L, 3L), (7L, 8L)))
    val preds = GroupNameRules.predict(spark, groups, edges)
      .as[(Long, Long, String)].collect().toSet
    assert(preds == Set((1L, 2L, RelationType.Family), (2L, 3L, RelationType.Family)))
  }

  test("pairs not present as edges are not predicted") {
    val groups = groupsDf(Seq((1L, "Li Family Group", "family", Seq(1L, 2L, 3L))))
    val edges = edgesDf(Seq((1L, 2L)))
    val preds = GroupNameRules.predict(spark, groups, edges).collect()
    assert(preds.length == 1)
  }

  test("generic groups contribute no predictions") {
    val groups = groupsDf(Seq((1L, "Weekend Buddies", "other", Seq(1L, 2L))))
    val edges = edgesDf(Seq((1L, 2L)))
    assert(GroupNameRules.predict(spark, groups, edges).count() == 0)
  }

  test("majority vote across conflicting indicative groups") {
    val groups = groupsDf(Seq(
      (1L, "Li Family Group", "family", Seq(1L, 2L)),
      (2L, "Zhang Family Group", "family", Seq(1L, 2L)),
      (3L, "Acme Corp Dept 1", "colleague", Seq(1L, 2L))))
    val edges = edgesDf(Seq((1L, 2L)))
    val preds = GroupNameRules.predict(spark, groups, edges)
      .as[(Long, Long, String)].collect()
    assert(preds.toSeq == Seq((1L, 2L, RelationType.Family)))
  }

  test("vote tie breaks by principal-type priority") {
    val groups = groupsDf(Seq(
      (1L, "Li Family Group", "family", Seq(1L, 2L)),
      (2L, "Acme Corp Dept 1", "colleague", Seq(1L, 2L))))
    val edges = edgesDf(Seq((1L, 2L)))
    val preds = GroupNameRules.predict(spark, groups, edges)
      .as[(Long, Long, String)].collect()
    assert(preds.toSeq == Seq((1L, 2L, RelationType.Family)))
  }

  test("each covered edge gets exactly one prediction") {
    val groups = groupsDf(Seq(
      (1L, "Li Family Group", "family", Seq(1L, 2L, 3L, 4L)),
      (2L, "Acme Corp Dept 9", "colleague", Seq(1L, 2L, 3L))))
    val edges = edgesDf(Seq((1L, 2L), (1L, 3L), (2L, 3L), (3L, 4L)))
    val preds = GroupNameRules.predict(spark, groups, edges).collect()
    assert(preds.map(r => (r.getLong(0), r.getLong(1))).distinct.length == preds.length)
    assert(preds.length == 4)
  }
}
