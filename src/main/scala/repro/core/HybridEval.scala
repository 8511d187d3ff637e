package repro.core

import repro.graph.LabeledGraph

/** Hybrid evaluation of the paper's extended query Q4 `a^+ ∘ b^+`
  * (Sec. VI-C): an online traversal over the `a^+` part combined with an
  * RLC-index probe at every intermediate vertex for the `b^+` part —
  * "use the RLC index in combination with an online traversal to
  * continuously check whether intermediately visited vertices can satisfy
  * the path constraint".
  */
object HybridEval {

  /** True iff there is a path s ⇝ t labeled `a^+ ∘ b^+`. */
  def concatPlus(g: LabeledGraph, index: RlcIndex, s: Int, t: Int, a: Int, b: Int): Boolean = {
    require(a != b)
    val bMr = LabelSeq.encode(Array(b))
    val seen = new java.util.BitSet(g.numVertices)
    var queue = List.empty[Int]

    def push(v: Int): Boolean = {
      if (!seen.get(v)) {
        // v is reachable from s via a^+ — probe the index for v ⇝ t via b^+.
        if (index.query(v, t, bMr)) return true
        seen.set(v); queue ::= v
      }
      false
    }

    var i = g.outOff(s)
    while (i < g.outOff(s + 1)) {
      if (g.outLabel(i) == a && push(g.outDst(i))) return true
      i += 1
    }
    while (queue.nonEmpty) {
      val v = queue.head; queue = queue.tail
      var j = g.outOff(v)
      while (j < g.outOff(v + 1)) {
        if (g.outLabel(j) == a && push(g.outDst(j))) return true
        j += 1
      }
    }
    false
  }
}
