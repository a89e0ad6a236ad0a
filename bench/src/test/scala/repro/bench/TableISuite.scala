package repro.bench

import repro.SparkSpec
import repro.wechat.RelationType

/** Table I — relationship types in user surveys.
  *
  * Paper (first-category ratios): family 28 %, colleague 41 %,
  * schoolmate 15 %, others 16 %. Our generator plants circles calibrated to
  * those ratios; this suite measures what the survey sample actually shows.
  */
class TableISuite extends SparkSpec {

  private lazy val rows = repro.exp.Experiments.tableI(spark, Bench.numUsers)

  private val paperFirst = Map(
    RelationType.Family -> 0.28, RelationType.Colleague -> 0.41,
    RelationType.Schoolmate -> 0.15, RelationType.Other -> 0.16)

  test("Table I: print survey relationship-type distribution (paper vs ours)") {
    Bench.banner(s"TABLE I — relationship types in user surveys (${Bench.numUsers} users)")
    println("| First | paper | ours | Second | ours |")
    val firsts = rows.map(r => r.first -> r.firstRatio).toMap
    rows.foreach { r =>
      println(f"| ${r.first}%-10s | ${paperFirst(r.first)}%.2f | ${firsts(r.first)}%.2f " +
              f"| ${r.second}%-10s | ${r.secondRatio}%.3f |")
    }
  }

  test("all four first categories are present") {
    assert(rows.map(_.first).toSet == RelationType.All.toSet)
  }

  test("first-category ratios land near the paper's 28/41/15/16") {
    val firsts = rows.map(r => r.first -> r.firstRatio).toMap
    paperFirst.foreach { case (t, p) =>
      assert(math.abs(firsts(t) - p) < 0.12, s"$t: paper $p vs ours ${firsts(t)}")
    }
  }

  test("colleagues dominate, as in the paper") {
    val firsts = rows.map(r => r.first -> r.firstRatio).toMap
    assert(firsts(RelationType.Colleague) == firsts.values.max)
  }

  test("major types cover ~84% of survey edges") {
    val firsts = rows.map(r => r.first -> r.firstRatio).toMap
    val major = RelationType.Major.map(firsts).sum
    assert(major > 0.72 && major < 0.95, s"major share $major")
  }

  test("second-category ratios partition each first category") {
    val firsts = rows.map(r => r.first -> r.firstRatio).toMap
    rows.groupBy(_.first).foreach { case (f, rs) =>
      assert(math.abs(rs.map(_.secondRatio).sum - firsts(f)) < 1e-9)
    }
  }
}
