package repro

import java.util.SplittableRandom
import repro.graph.{GraphGen, LabeledGraph}

/** Seeded small random graphs for correctness tests. */
object TestGraphs {

  /** A small cyclic digraph with possible self-loops and parallel labels. */
  def random(seed: Long, n: Int = 24, e: Int = 70, labels: Int = 3,
             loopShare: Double = 0.05): LabeledGraph = {
    val rng = new SplittableRandom(seed)
    val triples = Array.fill(e) {
      val s = rng.nextInt(n)
      val d = if (rng.nextDouble() < loopShare) s else rng.nextInt(n)
      (s, rng.nextInt(labels), d)
    }
    LabeledGraph.fromEdges(n, labels, triples)
  }

  /** A small BA-flavored skewed graph via the production generator. */
  def smallBa(seed: Long, n: Int = 60, e: Int = 220, labels: Int = 3): LabeledGraph =
    GraphGen.ba(n, e, labels, seed)

  /** A small ER graph via the production generator. */
  def smallEr(seed: Long, n: Int = 60, e: Int = 200, labels: Int = 3): LabeledGraph =
    GraphGen.er(n, e, labels, seed)
}
