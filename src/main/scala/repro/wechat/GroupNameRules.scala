package repro.wechat

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Rule-based group-name relationship mining (the paper's Table II).
  *
  * "Group names are sometimes indicative of the relationships between group
  * members. Class X in X Middle school or X Department in X Company imply
  * schoolmates and colleagues respectively." We match chat-group names
  * against such patterns and label every friend pair inside a matched group
  * with the indicated type. Precision is high; recall is tiny because most
  * groups have uninformative names and ~20 % of friend pairs share no group.
  */
object GroupNameRules {

  /** Map a chat-group name to a relationship type, or None. */
  def classifyName(name: String): Option[String] = {
    val n = name.toLowerCase
    if (n.contains("family")) Some(RelationType.Family)
    else if (n.contains("school") || n.contains("class ")) Some(RelationType.Schoolmate)
    else if (n.contains("corp") || n.contains("company") || n.contains("dept"))
      Some(RelationType.Colleague)
    else None
  }

  /** Predict edge types from chat-group names.
    *
    * @param chatGroups columns (gid, name, members: array<long>)
    * @param edges      columns (src, dst, ...) with src < dst
    * @return (src, dst, pred) for the edges covered by ≥1 indicative group;
    *         conflicts resolved by most-frequent indicated type, ties by
    *         [[RelationType.priority]].
    */
  def predict(spark: SparkSession, chatGroups: DataFrame, edges: DataFrame): DataFrame = {
    import spark.implicits._
    val classifyUdf = udf((name: String) => classifyName(name))
    val indicated = chatGroups
      .withColumn("pred", classifyUdf($"name"))
      .where($"pred".isNotNull)

    // all member pairs of each indicated group
    val pairs = indicated
      .select($"pred", $"members")
      .withColumn("u", explode($"members"))
      .withColumn("v", explode($"members"))
      .where($"u" < $"v")
      .select($"u" as "src", $"v" as "dst", $"pred")

    // keep only pairs that are actual friend edges
    val onEdges = pairs.join(edges.select("src", "dst"), Seq("src", "dst"))

    val prioUdf = udf((t: String) => RelationType.priority(t))
    onEdges
      .groupBy("src", "dst", "pred").agg(count(lit(1)) as "votes")
      .withColumn("prio", prioUdf($"pred"))
      .withColumn("rank", row_number().over(
        org.apache.spark.sql.expressions.Window
          .partitionBy("src", "dst").orderBy($"votes".desc, $"prio".asc)))
      .where($"rank" === 1)
      .select("src", "dst", "pred")
  }
}
