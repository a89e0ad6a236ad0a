package repro.wechat

/** Relationship type labels (the paper's Table I first categories) and the
  * principal-type priority used when an edge is covered by several circles
  * ("edges with multiple types should be labeled by their principal types"). */
object RelationType {
  val Family = "family"
  val Colleague = "colleague"
  val Schoolmate = "schoolmate"
  val Other = "other"
  val Unknown = "unknown"

  /** The three major categories LoCEC classifies (84 % of survey edges). */
  val Major: Seq[String] = Seq(Colleague, Family, Schoolmate)

  /** All first categories. */
  val All: Seq[String] = Seq(Family, Colleague, Schoolmate, Other)

  /** Lower = more principal. A family tie dominates a colleague tie, etc. */
  def priority(t: String): Int = t match {
    case Family     => 0
    case Colleague  => 1
    case Schoolmate => 2
    case Other      => 3
    case _          => 4
  }
}
