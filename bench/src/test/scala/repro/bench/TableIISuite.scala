package repro.bench

import repro.SparkSpec
import repro.wechat.RelationType

/** Table II — group-name rule classification.
  *
  * Paper: precision 0.705 / 0.821 / 0.934 (family / colleague / schoolmate)
  * with recall 0.014 / 0.005 / 0.008 — high precision, uselessly low recall,
  * which motivates LoCEC.
  */
class TableIISuite extends SparkSpec {

  private lazy val scores = repro.exp.Experiments.tableII(spark, Bench.st)

  private val paper = Map(
    RelationType.Family -> (0.705, 0.014),
    RelationType.Colleague -> (0.821, 0.005),
    RelationType.Schoolmate -> (0.934, 0.008))

  test("Table II: print group-name rule performance (paper vs ours)") {
    Bench.banner(s"TABLE II — group-name rule classification (${Bench.numUsers} users)")
    println("| Type | paper P | ours P | paper R | ours R | ours F1 |")
    scores.dropRight(1).foreach { s =>
      val (pp, pr) = paper.getOrElse(s.label, (Double.NaN, Double.NaN))
      println(f"| ${s.label}%-10s | $pp%.3f | ${s.precision}%.3f | $pr%.3f | ${s.recall}%.3f | ${s.f1}%.3f |")
    }
    val o = scores.last
    println(f"| overall    |   -   | ${o.precision}%.3f |   -   | ${o.recall}%.3f | ${o.f1}%.3f |")
  }

  test("recall is tiny for every type (the sparsity problem)") {
    scores.foreach(s => assert(s.recall < 0.12, s"${s.label} recall ${s.recall}"))
  }

  test("precision is far above recall wherever rules fire") {
    val firing = scores.dropRight(1).filter(_.precision > 0)
    assert(firing.nonEmpty, "no indicative group names matched at all")
    firing.foreach(s => assert(s.precision > 5 * s.recall, s"${s.label}: $s"))
  }

  test("precision is high in absolute terms where rules fire") {
    val firing = scores.dropRight(1).filter(_.precision > 0)
    firing.foreach(s => assert(s.precision > 0.5, s"${s.label} precision ${s.precision}"))
  }

  test("all three major types are scored") {
    assert(scores.dropRight(1).map(_.label).toSet == RelationType.Major.toSet)
  }
}
