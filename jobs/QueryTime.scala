package repro.jobs

import repro.exp.Experiments

/** Fig. 3-flavored query-set timing: RLC index vs BFS vs BiBFS.
  * Usage: spark-submit ... repro.jobs.QueryTime [GRAPH ...]   (default AD TW WN)
  */
object QueryTime {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("rlc-querytime")
    val cfgs = if (args.isEmpty) Seq("AD", "TW", "WN").map(repro.graph.GraphGen.lite)
               else JobSession.configs(args)
    try println(Experiments.renderQT(Experiments.queryTime(spark, cfgs, log = println)))
    finally spark.stop()
  }
}
