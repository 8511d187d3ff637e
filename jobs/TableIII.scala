package repro.jobs

import repro.exp.Experiments

/** Reproduces Table III (graph suite overview).
  * Usage: spark-submit ... repro.jobs.TableIII [GRAPH ...]
  */
object TableIII {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("rlc-table3")
    try println(Experiments.renderT3(Experiments.tableIII(spark, JobSession.configs(args))))
    finally spark.stop()
  }
}
