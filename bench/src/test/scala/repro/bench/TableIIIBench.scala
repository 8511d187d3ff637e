package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.graph.GraphGen

/** Table III: overview of the graph suite — |V|, |E|, |L|, loop count,
  * triangle count — computed with Spark DataFrame jobs over the lite
  * analogs, printed next to the paper's full-scale originals.
  *
  * Subset via REPRO_GRAPHS=AD,EP,... (default: all 13).
  */
class TableIIIBench extends SparkSpec {

  test("Table III — graph suite overview") {
    val names = sys.env.get("REPRO_GRAPHS")
      .map(_.split(",").map(_.trim).toSeq)
      .getOrElse(GraphGen.liteSuite.map(_.name))
    val cfgs = names.map(GraphGen.lite)

    val rows = Experiments.tableIII(spark, cfgs)
    println(Experiments.renderT3(rows))

    rows.foreach { r =>
      assert(r.v == r.cfg.v, s"${r.cfg.name}: vertex count")
      assert(r.labels <= r.cfg.labels, s"${r.cfg.name}: labels")
      assert(r.e > 0.8 * r.cfg.e && r.e <= 1.05 * r.cfg.e, s"${r.cfg.name}: |E|=${r.e} target ${r.cfg.e}")
      if (r.cfg.loops == 0) assert(r.loops == 0, s"${r.cfg.name}: unexpected loops")
      else assert(r.loops > 0.5 * r.cfg.loops, s"${r.cfg.name}: loops=${r.loops} target ${r.cfg.loops}")
    }

    // shape assertions mirroring the paper's suite: SO is the most loop-heavy,
    // and the dense web analogs carry large triangle counts
    val byName = rows.map(r => r.cfg.name -> r).toMap
    for (so <- byName.get("SO"); other <- rows if other.cfg.name != "SO")
      assert(so.loops >= other.loops, s"SO must be loop-heaviest (vs ${other.cfg.name})")
  }
}
