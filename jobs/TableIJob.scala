package repro.jobs

import repro.exp.Experiments

/** Reproduces Table I: relationship types in user surveys. */
object TableIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("locec-table1")
    val rows = Experiments.tableI(spark, JobSession.benchUsers)
    println("| First | First Ratio | Second | Second Ratio |")
    rows.foreach { r =>
      println(f"| ${r.first}%-10s | ${r.firstRatio}%.2f | ${r.second}%-10s | ${r.secondRatio}%.2f |")
    }
    spark.stop()
  }
}
