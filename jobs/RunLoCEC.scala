package repro.jobs

import repro.core.LoCEC
import repro.exp.Experiments

/** End-to-end LoCEC run over a generated network: classifies every edge
  * and prints the predicted relationship-type distribution (the pipeline
  * behind the paper's Fig. 13 deployment numbers). */
object RunLoCEC {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("locec-run")
    val variant = if (args.contains("--xgb")) LoCEC.Xgb else LoCEC.Cnn
    val st = Experiments.setup(spark, JobSession.benchUsers)
    val res = LoCEC.run(spark, st.edges, st.interactions, st.userFeatures,
      st.trainEdges, LoCEC.Params(variant = variant))
    println(s"communities classified: ${res.commPreds.count()}")
    println(s"edges labeled:          ${res.edgePreds.count()}")
    println("predicted relationship distribution:")
    res.edgePreds.groupBy("pred").count().orderBy("pred").show(false)
    println("predicted community distribution:")
    res.commPreds.groupBy("pred").count().orderBy("pred").show(false)
    println(f"timings: training=${res.timings.trainingSec}%.1f s " +
            f"phase1=${res.timings.phase1Sec}%.1f s phase2=${res.timings.phase2Sec}%.1f s " +
            f"phase3=${res.timings.phase3Sec}%.1f s")
    spark.stop()
  }
}
