package repro.wechat

import org.apache.spark.sql.{Dataset, SparkSession}
import scala.collection.mutable
import scala.util.Random

/** Synthetic WeChat-like social network with planted ground truth.
  *
  * Substitutes the proprietary WeChat graph + survey data (see DESIGN.md):
  * users are grouped into real-world circles — families, workplaces, school
  * classes and interest groups — and edges are sampled inside circles (plus
  * random noise edges). The ground-truth type of an edge is the type of the
  * most principal shared circle. Interaction counts on 7 dimensions
  * (message, like/comment × picture/article/game) follow per-type propensity
  * profiles calibrated to the paper's Fig. 3, with a dormant-pair rate that
  * reproduces the ~60 % zero-interaction sparsity. A "surveyed" node subset
  * determines which edge labels are observed, as in the paper's user survey.
  *
  * Structure generation runs on the driver with a seeded RNG (it is the
  * *input* of the paper's system, not its contribution) and is handed to
  * Spark as Datasets; everything downstream is distributed dataflow.
  */
object SocialGen {

  /** Interaction dimension names; index = position in the `inter` array. */
  val InteractionDims: Seq[String] =
    Seq("message", "like_picture", "like_article", "like_game",
        "comment_picture", "comment_article", "comment_game")

  final case class Config(
      numUsers: Int = 2000,
      seed: Long = 42,
      familySizeMin: Int = 3, familySizeMax: Int = 9, pFamilyEdge: Double = 0.95,
      pEmployed: Double = 0.70, workSizeMin: Int = 8, workSizeMax: Int = 50, pWorkEdge: Double = 0.30,
      pEnrolled: Double = 0.60, schoolSizeMin: Int = 12, schoolSizeMax: Int = 35, pSchoolEdge: Double = 0.16,
      pInterest: Double = 0.35, interestSizeMin: Int = 5, interestSizeMax: Int = 25, pInterestEdge: Double = 0.15,
      noisePerUser: Double = 0.30,
      pDormantPair: Double = 0.45,
      surveyedFrac: Double = 0.225,
      pChatGroup: Double = 0.5,
      pIndicativeName: Double = 0.06,
      pChatJoin: Double = 0.8)

  final case class User(user: Long, gender: Int, age: Int, city: Int, surveyed: Boolean)
  /** `label`/`second` are the planted ground truth; `labeled` marks edges
    * observed via the survey (incident to a surveyed user). src < dst. */
  final case class Edge(src: Long, dst: Long, label: String, second: String, labeled: Boolean)
  final case class Interaction(src: Long, dst: Long, inter: Seq[Double])
  final case class ChatGroup(gid: Long, name: String, gtype: String, members: Seq[Long])
  final case class CircleMembership(user: Long, circle: Long, ctype: String)

  final case class Network(users: Dataset[User], edges: Dataset[Edge],
                           interactions: Dataset[Interaction],
                           chatGroups: Dataset[ChatGroup],
                           circles: Dataset[CircleMembership])

  /** Per-type probability that an active (non-dormant) pair interacts on
    * each dimension — calibrated to the paper's Fig. 3 (families like/comment
    * pictures, colleagues articles, schoolmates games). */
  private val profiles: Map[String, Array[Double]] = Map(
    RelationType.Family     -> Array(0.60, 0.55, 0.12, 0.04, 0.50, 0.08, 0.04),
    RelationType.Colleague  -> Array(0.55, 0.45, 0.38, 0.06, 0.40, 0.33, 0.03),
    RelationType.Schoolmate -> Array(0.50, 0.50, 0.22, 0.35, 0.45, 0.12, 0.32),
    RelationType.Other      -> Array(0.25, 0.25, 0.15, 0.10, 0.18, 0.10, 0.08))

  /** Second-category multinomials, conditional on the first category —
    * Table I's conditional ratios (e.g. family 28 % → kin 16, in-law 5,
    * unknown 7). School second categories come from the school level. */
  private val secondCats: Map[String, Seq[(String, Double)]] = Map(
    RelationType.Family    -> Seq("kin" -> 16.0 / 28, "in-law" -> 5.0 / 28, "unknown" -> 7.0 / 28),
    RelationType.Colleague -> Seq("current" -> 14.0 / 41, "past" -> 25.0 / 41, "unknown" -> 3.0 / 41),
    RelationType.Other     -> Seq("interest" -> 9.0 / 16, "business" -> 1.0 / 16,
                                  "agent" -> 1.0 / 16, "unknown" -> 5.0 / 16))
  private val schoolLevels: Seq[(String, Double)] =
    Seq("primary" -> 2.0 / 15, "middle" -> 4.0 / 15, "university" -> 8.0 / 15, "unknown" -> 1.0 / 15)

  private def draw(rng: Random, table: Seq[(String, Double)]): String = {
    val r = rng.nextDouble()
    var acc = 0.0
    table.foreach { case (v, p) => acc += p; if (r < acc) return v }
    table.last._1
  }

  private final case class Circle(id: Long, ctype: String, members: Array[Int],
                                  level: String, pEdge: Double)

  /** Generate the full network. Deterministic in `cfg` (incl. seed). */
  def generate(spark: SparkSession, cfg: Config): Network = {
    import spark.implicits._
    val rng = new Random(cfg.seed)
    val n = cfg.numUsers

    // ---- circles -------------------------------------------------------
    def chunk(userIds: Array[Int], lo: Int, hi: Int): Seq[Array[Int]] = {
      val out = Seq.newBuilder[Array[Int]]
      var i = 0
      while (i < userIds.length) {
        val size = lo + rng.nextInt(hi - lo + 1)
        out += userIds.slice(i, math.min(i + size, userIds.length))
        i += size
      }
      out.result().filter(_.length >= 2)
    }
    var nextCircle = 0L
    def mkCircles(members: Seq[Array[Int]], ctype: String, pEdge: Double,
                  withLevel: Boolean): Seq[Circle] =
      members.map { m =>
        val id = nextCircle; nextCircle += 1
        val level = if (withLevel) draw(rng, schoolLevels) else ""
        Circle(id, ctype, m, level, pEdge)
      }

    val allUsers = rng.shuffle((0 until n).toVector).toArray
    val families = mkCircles(chunk(allUsers, cfg.familySizeMin, cfg.familySizeMax),
                             RelationType.Family, cfg.pFamilyEdge, withLevel = false)
    val employed = rng.shuffle((0 until n).filter(_ => rng.nextDouble() < cfg.pEmployed).toVector).toArray
    val works = mkCircles(chunk(employed, cfg.workSizeMin, cfg.workSizeMax),
                          RelationType.Colleague, cfg.pWorkEdge, withLevel = false)
    val enrolled = rng.shuffle((0 until n).filter(_ => rng.nextDouble() < cfg.pEnrolled).toVector).toArray
    val schools = mkCircles(chunk(enrolled, cfg.schoolSizeMin, cfg.schoolSizeMax),
                            RelationType.Schoolmate, cfg.pSchoolEdge, withLevel = true)
    val hobbyists = rng.shuffle((0 until n).filter(_ => rng.nextDouble() < cfg.pInterest).toVector).toArray
    val interests = mkCircles(chunk(hobbyists, cfg.interestSizeMin, cfg.interestSizeMax),
                              RelationType.Other, cfg.pInterestEdge, withLevel = false)
    val circles = families ++ works ++ schools ++ interests

    // ---- user attributes ----------------------------------------------
    // age: same cohort inside a school circle, widely spread inside families
    val age = Array.tabulate(n)(_ => 20 + rng.nextInt(45))
    schools.foreach { c =>
      val cohort = c.level match {
        case "primary"    => 11
        case "middle"     => 15
        case "university" => 21
        case _            => 18 + rng.nextInt(6)
      }
      c.members.foreach(u => age(u) = math.max(8, cohort + rng.nextInt(3) - 1))
    }
    val city = new Array[Int](n)
    val nCities = math.max(2, n / 500)
    families.foreach { c =>
      val fc = rng.nextInt(nCities)
      c.members.foreach(u => city(u) = fc)
    }
    val gender = Array.tabulate(n)(_ => rng.nextInt(2))
    val surveyed = Array.tabulate(n)(_ => rng.nextDouble() < cfg.surveyedFrac)

    // ---- edges ---------------------------------------------------------
    // per pair, keep the most principal covering circle
    final case class EdgeInfo(var ctype: String, var level: String)
    val pairMap = mutable.LinkedHashMap.empty[(Int, Int), EdgeInfo]
    circles.foreach { c =>
      val m = c.members
      var i = 0
      while (i < m.length) {
        var j = i + 1
        while (j < m.length) {
          if (rng.nextDouble() < c.pEdge) {
            val key = if (m(i) < m(j)) (m(i), m(j)) else (m(j), m(i))
            pairMap.get(key) match {
              case Some(info) =>
                if (RelationType.priority(c.ctype) < RelationType.priority(info.ctype)) {
                  info.ctype = c.ctype; info.level = c.level
                }
              case None => pairMap(key) = EdgeInfo(c.ctype, c.level)
            }
          }
          j += 1
        }
        i += 1
      }
    }
    val numNoise = (n * cfg.noisePerUser).toInt
    var added = 0
    while (added < numNoise) {
      val a = rng.nextInt(n); val b = rng.nextInt(n)
      if (a != b) {
        val key = if (a < b) (a, b) else (b, a)
        if (!pairMap.contains(key)) pairMap(key) = EdgeInfo(RelationType.Other, "")
        added += 1
      }
    }

    val edges = pairMap.iterator.map { case ((u, v), info) =>
      val second = info.ctype match {
        case RelationType.Schoolmate =>
          if (info.level == "unknown" || info.level.isEmpty) "unknown" else info.level
        case t => draw(rng, secondCats(t))
      }
      Edge(u.toLong, v.toLong, info.ctype, second, surveyed(u) || surveyed(v))
    }.toVector

    // ---- interactions --------------------------------------------------
    val interactions = edges.flatMap { e =>
      if (rng.nextDouble() < cfg.pDormantPair) None
      else {
        val prof = profiles(e.label)
        val inter = Array.tabulate(prof.length) { j =>
          if (rng.nextDouble() < prof(j)) {
            (1 + math.floor(-math.log(math.max(rng.nextDouble(), 1e-12)) * 2.0)).min(25.0)
          } else 0.0
        }
        if (inter.forall(_ == 0.0)) None
        else Some(Interaction(e.src, e.dst, inter.toSeq))
      }
    }

    // ---- chat groups ---------------------------------------------------
    val surnames = Array("Zhang", "Wang", "Li", "Liu", "Chen", "Yang", "Huang", "Zhao")
    val corps = Array("Acme", "Globex", "Initech", "Umbrella", "Hooli", "Stark")
    val schoolNames = Array("Sunshine", "Riverside", "Hilltop", "Lakeview", "Evergreen")
    val generics = Array("Happy Friends", "Weekend Buddies", "Trip 2019", "Foodies", "Neighbors")
    val chatGroups = circles.flatMap { c =>
      if (rng.nextDouble() >= cfg.pChatGroup) None
      else {
        val members = c.members.filter(_ => rng.nextDouble() < cfg.pChatJoin)
        if (members.length < 2) None
        else {
          val indicative = rng.nextDouble() < cfg.pIndicativeName
          // indicative names are occasionally misleading (a "family" group
          // containing in-laws' colleagues, a reunion chat named after the
          // company, ...) — this produces the <1.0 precision of Table II.
          val wrongRate = c.ctype match {
            case RelationType.Family     => 0.28
            case RelationType.Colleague  => 0.17
            case RelationType.Schoolmate => 0.06
            case _                       => 0.5
          }
          val nameType =
            if (!indicative) ""
            else if (rng.nextDouble() < wrongRate)
              rng.shuffle(RelationType.Major.filter(_ != c.ctype)).head
            else c.ctype
          val name = nameType match {
            case RelationType.Family =>
              s"${surnames(rng.nextInt(surnames.length))} Family Group"
            case RelationType.Colleague =>
              s"${corps(rng.nextInt(corps.length))} Corp Dept ${1 + rng.nextInt(9)}"
            case RelationType.Schoolmate =>
              s"Class ${1 + rng.nextInt(9)} of ${schoolNames(rng.nextInt(schoolNames.length))} School"
            case _ =>
              s"${generics(rng.nextInt(generics.length))} ${c.id}"
          }
          Some(ChatGroup(c.id, name, c.ctype, members.map(_.toLong).toSeq))
        }
      }
    }

    val users = (0 until n).map(u => User(u.toLong, gender(u), age(u), city(u), surveyed(u)))
    val memberships = circles.flatMap(c => c.members.map(u => CircleMembership(u.toLong, c.id, c.ctype)))

    Network(
      users = spark.createDataset(users),
      edges = spark.createDataset(edges),
      interactions = spark.createDataset(interactions),
      chatGroups = spark.createDataset(chatGroups),
      circles = spark.createDataset(memberships))
  }

  /** Per-user individual feature vector f_u = [gender, age/60] (|f| = 2) —
    * "basic attributes … independent of the local community" (Sec. IV-B). */
  def userFeature(u: User): Array[Double] = Array(u.gender.toDouble, u.age / 60.0)

  /** |f| for feature-matrix sizing. */
  val UserFeatureDim: Int = 2
}
