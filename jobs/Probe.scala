package repro.jobs

import repro.core.RlcIndexBuilder
import repro.exp.Experiments.time
import repro.graph.GraphGen
import repro.spark.DistRlcIndexBuilder

/** Ad-hoc performance probe (not part of the reproduction tables). */
object Probe {
  def main(args: Array[String]): Unit = {
    val name = args.headOption.getOrElse("AD")
    val distOnly = args.contains("dist")
    val spark = JobSession.get("rlc-probe")
    val (g, genT) = time(GraphGen.lite(name).generate())
    println(f"$name: |V|=${g.numVertices} |E|=${g.numEdges} |L|=${g.numLabels} gen=$genT%.1fs")
    if (!distOnly) {
      val (seq, seqT) = time(RlcIndexBuilder.build(g, 2))
      println(f"sequential: $seqT%.2fs entries=${seq.entryCount} size=${seq.sizeInMB}%.1fMB")
    }
    if (!args.contains("noindex")) {
      val (dist, distT) = time(DistRlcIndexBuilder.build(spark, g, 2))
      println(f"distributed: $distT%.2fs entries=${dist.entryCount} size=${dist.sizeInMB}%.1fMB")
    }
    if (args.contains("etc")) {
      val budget = sys.env.get("REPRO_ETC_BUDGET_MS").map(_.toLong).getOrElse(240_000L)
      val (etc, etcT) = time(repro.baseline.Etc.build(g, 2, budgetMs = budget))
      etc match {
        case Some(e) => println(f"etc: $etcT%.2fs pairs=${e.pairCount} mrs=${e.mrCount} size=${e.sizeInMB}%.1fMB")
        case None    => println(f"etc: budget exceeded after $etcT%.2fs")
      }
    }
    spark.stop()
  }
}
