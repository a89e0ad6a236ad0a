package repro.jobs

import repro.exp.Experiments

/** Reproduces Table IV: relationship (edge) classification performance of
  * ProbWP, Economix, XGBoost, LoCEC-XGB and LoCEC-CNN. */
object TableIVJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("locec-table4")
    val st = Experiments.setup(spark, JobSession.benchUsers)
    Experiments.tableIV(spark, st).foreach { case (algo, scores) =>
      println(Experiments.formatScores(algo, scores))
    }
    spark.stop()
  }
}
