package repro.core

import java.util.SplittableRandom
import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.baseline.{Nfa, NfaBfs}
import repro.graph.LabeledGraph

/** Q4 hybrid evaluation (index probe inside an online a-BFS) against the
  * pure automaton-guided traversal.
  */
class HybridEvalSpec extends AnyFunSuite {

  for (seed <- 1 to 6)
    test(s"hybrid a+b+ ≡ NFA BFS on random graph seed=$seed") {
      val g = TestGraphs.random(seed, n = 22, e = 75, labels = 3)
      val index = RlcIndexBuilder.build(g, 2)
      val rng = new SplittableRandom(seed)
      for (_ <- 1 to 100) {
        val s = rng.nextInt(g.numVertices)
        val t = rng.nextInt(g.numVertices)
        val a = rng.nextInt(3)
        var b = rng.nextInt(3); while (b == a) b = rng.nextInt(3)
        val expected = NfaBfs.bfs(g, s, t, Nfa.concatPlus(a, b, 3)).get
        assert(HybridEval.concatPlus(g, index, s, t, a, b) == expected,
          s"s=$s t=$t a=$a b=$b")
      }
    }

  test("hand case: 0 -a-> 1 -a-> 2 -b-> 3") {
    val g = LabeledGraph.fromEdges(4, 2, Array((0, 0, 1), (1, 0, 2), (2, 1, 3)))
    val index = RlcIndexBuilder.build(g, 2)
    assert(HybridEval.concatPlus(g, index, 0, 3, 0, 1))  // aab
    assert(HybridEval.concatPlus(g, index, 1, 3, 0, 1))  // ab
    assert(!HybridEval.concatPlus(g, index, 2, 3, 0, 1)) // b alone: no a+
    assert(!HybridEval.concatPlus(g, index, 0, 2, 0, 1)) // aa: no b+
    assert(!HybridEval.concatPlus(g, index, 0, 3, 1, 0))
  }
}
