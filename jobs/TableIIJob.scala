package repro.jobs

import repro.exp.Experiments

/** Reproduces Table II: group-name rule classification performance. */
object TableIIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("locec-table2")
    val st = Experiments.setup(spark, JobSession.benchUsers)
    Experiments.tableII(spark, st).foreach(s => println(s.row))
    spark.stop()
  }
}
