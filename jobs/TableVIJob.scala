package repro.jobs

import repro.exp.Experiments

/** Reproduces Table VI: running time of LoCEC-CNN per phase (seconds on
  * local[*]; the paper reports hours on 100 servers). */
object TableVIJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("locec-table6")
    val st = Experiments.setup(spark, JobSession.benchUsers)
    val t = Experiments.tableVI(spark, st)
    println("| Method | Training | Phase I | Phase II | Phase III | Total |")
    println(f"| LoCEC-CNN | ${t.trainingSec}%.1f s | ${t.phase1Sec}%.1f s | " +
            f"${t.phase2Sec}%.1f s | ${t.phase3Sec}%.1f s | ${t.totalSec}%.1f s |")
    spark.stop()
  }
}
