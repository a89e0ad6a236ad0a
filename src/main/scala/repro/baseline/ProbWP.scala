package repro.baseline

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.ml.MinHash
import repro.wechat.RelationType

/** ProbWP [Aggarwal, He & Zhao, ICDE'16] — the label-propagation comparator.
  *
  * Structural similarity between nodes is estimated with min-hash signatures
  * of their neighbor sets (the paper sets 20 hash functions). For an
  * unlabeled edge <u, v>, take the top-k most structurally similar nodes
  * S_u and S_v, and assign the dominant label among *labeled* edges with
  * one end in S_u and the other in S_v; abstain ("unknown") when no labeled
  * edge connects the two sets — which is what makes the method collapse
  * when labels are sparse.
  */
object ProbWP {

  final case class Params(numHashes: Int = 20, topK: Int = 10, seed: Long = 11)

  /** Predict labels for `targets` (src, dst) given `trainEdges`
    * (src, dst, label). `edges` is the full canonical edge list. */
  def run(spark: SparkSession, edges: DataFrame, trainEdges: DataFrame,
          targets: DataFrame, params: Params = Params()): DataFrame = {
    import spark.implicits._
    val sym = edges.select($"src" as "node", $"dst" as "nbr")
      .union(edges.select($"dst" as "node", $"src" as "nbr"))

    // min-hash signature of every node's neighbor set
    val mh = new MinHash(params.numHashes, params.seed)
    val sigUdf = udf((nbrs: Seq[Long]) => mh.signature(nbrs))
    val sigs = sym.groupBy("node").agg(collect_list($"nbr") as "nbrs")
      .select($"node", sigUdf($"nbrs") as "sig")

    // candidate structurally-similar pairs: nodes sharing >= 1 neighbor
    val candidates = sym.as("x").join(sym.as("y"), $"x.nbr" === $"y.nbr" && $"x.node" =!= $"y.node")
      .select($"x.node" as "a", $"y.node" as "b").distinct()

    val simUdf = udf((s1: Seq[Long], s2: Seq[Long]) =>
      mh.similarity(s1.toArray, s2.toArray))
    val sims = candidates
      .join(sigs.select($"node" as "a", $"sig" as "sigA"), Seq("a"))
      .join(sigs.select($"node" as "b", $"sig" as "sigB"), Seq("b"))
      .select($"a", $"b", simUdf($"sigA", $"sigB") as "sim")

    // S_a: top-k most similar nodes per node (ties by id for determinism)
    val topSim = sims.withColumn("rank",
        row_number().over(Window.partitionBy("a").orderBy($"sim".desc, $"b".asc)))
      .where($"rank" <= params.topK)
      .select($"a", $"b" as "similar")

    // expand each target edge into S_u × S_v and vote with labeled edges
    val expanded = targets.select("src", "dst")
      .join(topSim.select($"a" as "src", $"similar" as "s1"), Seq("src"))
      .join(topSim.select($"a" as "dst", $"similar" as "s2"), Seq("dst"))
      .where($"s1" =!= $"s2")
      .select($"src", $"dst",
        least($"s1", $"s2") as "ls", greatest($"s1", $"s2") as "gs")

    val votes = expanded.join(
        trainEdges.select($"src" as "ls", $"dst" as "gs", $"label"), Seq("ls", "gs"))
      .groupBy("src", "dst", "label").agg(count(lit(1)) as "votes")
      .withColumn("rank", row_number().over(
        Window.partitionBy("src", "dst").orderBy($"votes".desc, $"label".asc)))
      .where($"rank" === 1)
      .select($"src", $"dst", $"label" as "pred")

    targets.select("src", "dst")
      .join(votes, Seq("src", "dst"), "left")
      .select($"src", $"dst", coalesce($"pred", lit(RelationType.Unknown)) as "pred")
  }
}
