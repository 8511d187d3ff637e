package repro.baseline

import repro.core.LabelSeq
import repro.graph.LabeledGraph

/** Independent reference evaluator for tests — deliberately written as a
  * plain DFS over `(vertex, phase)` with direct modular arithmetic, sharing
  * no code with the NFA machinery or the index, so that agreement between
  * the three implementations is meaningful evidence of correctness.
  */
object BruteForce {

  /** Does a path s -> t with label sequence in `L^+` exist? */
  def reach(g: LabeledGraph, s: Int, t: Int, code: Long): Boolean = {
    val m = LabelSeq.length(code)
    val lab = LabelSeq.decode(code)
    val seen = new java.util.BitSet(g.numVertices * m)
    val stack = new java.util.ArrayDeque[Integer]()

    def push(v: Int, phase: Int): Unit = {
      val st = v * m + phase
      if (!seen.get(st)) { seen.set(st); stack.push(st) }
    }

    // Seed with the one-step successors so "at least one full L" is enforced
    // by phase arithmetic alone (reaching (t, 0) then means length ≡ 0 mod m
    // and length >= 1, hence a positive multiple of m matching L cyclically).
    var i = g.outOff(s)
    while (i < g.outOff(s + 1)) {
      if (g.outLabel(i) == lab(0)) push(g.outDst(i), 1 % m)
      i += 1
    }
    while (!stack.isEmpty) {
      val st = stack.pop().intValue()
      val v = st / m; val phase = st % m
      if (v == t && phase == 0) return true
      var j = g.outOff(v)
      while (j < g.outOff(v + 1)) {
        if (g.outLabel(j) == lab(phase)) push(g.outDst(j), (phase + 1) % m)
        j += 1
      }
    }
    false
  }

  /** All primitive label sequences of length <= k over the graph's alphabet. */
  def primitives(numLabels: Int, k: Int): Seq[Long] = {
    def seqs(len: Int): Seq[List[Int]] =
      if (len == 0) Seq(Nil)
      else for (rest <- seqs(len - 1); l <- 0 until numLabels) yield l :: rest
    for {
      len  <- 1 to k
      s    <- seqs(len)
      code  = LabelSeq.encode(s.toArray)
      if LabelSeq.isPrimitive(code)
    } yield code
  }

  /** The concise set S^k(s,t) (Def. 2) by exhaustive constraint checking —
    * viable only on small test graphs.
    */
  def concise(g: LabeledGraph, s: Int, t: Int, k: Int): Set[Long] =
    primitives(g.numLabels, k).filter(reach(g, s, t, _)).toSet
}
