package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.graph.GraphGen

/** Fig. 3-flavored supplement: per-set execution time of true/false query
  * sets — RLC index vs online BFS vs BiBFS (the paper's up-to-six-orders
  * headline). Figures are out of scope; this backs the claim behind
  * Table V's speed-ups with set-level numbers like the paper's Fig. 3.
  *
  * Knobs: REPRO_QT_GRAPHS (default AD,TW,WN), REPRO_QT_N (default 200).
  */
class QueryTimeBench extends SparkSpec {

  test("query-set execution time: RLC vs BFS vs BiBFS") {
    val names = sys.env.getOrElse("REPRO_QT_GRAPHS", "AD,TW,WN").split(",").map(_.trim).toSeq
    val n = sys.env.get("REPRO_QT_N").map(_.toInt).getOrElse(200)
    val rows = Experiments.queryTime(spark, names.map(GraphGen.lite), n,
      log = s => println(s"  $s"))
    println(Experiments.renderQT(rows))

    rows.foreach { r =>
      val rlc = r.rlcTrue + r.rlcFalse
      val bfs = r.bfsTrue + r.bfsFalse
      val bibfs = r.bibfsTrue + r.bibfsFalse
      assert(rlc < bfs, s"${r.name}: RLC must beat BFS ($rlc vs $bfs)")
      assert(rlc < bibfs, s"${r.name}: RLC must beat BiBFS ($rlc vs $bibfs)")
      assert(bfs / rlc > 100, s"${r.name}: expected orders-of-magnitude gap, got ${bfs / rlc}x")
    }
  }
}
