package repro.jobs

import repro.exp.Experiments
import repro.graph.GraphGen

/** Reproduces Table V (speed-ups and break-even points over engine
  * stand-ins, one k=3 index).
  * Usage: spark-submit ... repro.jobs.TableV [GRAPH]   (default WN)
  */
object TableV {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("rlc-table5")
    val cfg = GraphGen.lite(args.headOption.getOrElse("WN"))
    try {
      val (it, size, rows) = Experiments.tableV(spark, cfg, log = println)
      println(Experiments.renderT5(it, size, rows))
    } finally spark.stop()
  }
}
