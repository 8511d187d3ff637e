package repro.jobs

import repro.exp.Experiments

/** Reproduces Table IV (RLC vs ETC indexing time and index size, k=2).
  * Usage: spark-submit ... repro.jobs.TableIV [GRAPH ...]
  * Env: REPRO_ETC_BUDGET_MS (default 240000), REPRO_ETC_EDGE_LIMIT (150000).
  */
object TableIV {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("rlc-table4")
    val etcBudget = sys.env.get("REPRO_ETC_BUDGET_MS").map(_.toLong).getOrElse(240_000L)
    val etcLimit  = sys.env.get("REPRO_ETC_EDGE_LIMIT").map(_.toInt).getOrElse(150_000)
    try {
      val rows = Experiments.tableIV(spark, JobSession.configs(args),
        etcEdgeLimit = etcLimit, etcBudgetMs = etcBudget,
        onRow = r => println(s"  done ${r.name}"))
      println(Experiments.renderT4(rows))
    } finally spark.stop()
  }
}
