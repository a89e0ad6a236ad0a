package repro.jobs

import repro.exp.Experiments

/** Reproduces Table V: local community classification performance of
  * LoCEC-XGB and LoCEC-CNN. */
object TableVJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("locec-table5")
    val st = Experiments.setup(spark, JobSession.benchUsers)
    Experiments.tableV(spark, st).foreach { case (algo, scores) =>
      println(Experiments.formatScores(algo, scores))
    }
    spark.stop()
  }
}
