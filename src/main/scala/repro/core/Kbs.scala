package repro.core

import repro.graph.LabeledGraph

/** Insert callback for a KBS run from a fixed root. Returns true if the
  * entry was recorded, false if it was pruned (PR1/PR2) — in the kernel-BFS
  * phase a false return triggers PR3 (the visited vertex and everything
  * beyond it are skipped).
  */
trait Inserter {
  /** Backward KBS from `root` visited `y` via a path y ⇝ root whose k-MR is
    * `mr`: record `(root, mr)` in `L_out(y)`.
    */
  def insertOut(y: Int, mr: Long): Boolean

  /** Forward KBS from `root` visited `y` via a path root ⇝ y whose k-MR is
    * `mr`: record `(root, mr)` in `L_in(y)`.
    */
  def insertIn(y: Int, mr: Long): Boolean
}

/** Reusable per-thread scratch space: a stamped visited array over
  * `(vertex, phase)` product states plus growable queues, so a full index
  * build allocates almost nothing per vertex searched.
  */
final class KbsScratch(val numVertices: Int, val k: Int) {
  require(numVertices.toLong * k < Int.MaxValue, "product state space too large")
  val visit = new Array[Int](numVertices * k)
  var stamp = 0

  var qv = new Array[Int](1024)   // kernel-search queue: vertices
  var qs = new Array[Long](1024)  //                      packed sequences
  var bq = new Array[Int](1024)   // kernel-BFS queue: packed v*k+phase

  def growSearch(needed: Int): Unit =
    if (needed > qv.length) {
      val cap = math.max(needed, qv.length * 2)
      qv = java.util.Arrays.copyOf(qv, cap)
      qs = java.util.Arrays.copyOf(qs, cap)
    }

  def growBfs(needed: Int): Unit =
    if (needed > bq.length) bq = java.util.Arrays.copyOf(bq, math.max(needed, bq.length * 2))
}

/** Eager kernel-based search (paper Sec. IV + Algorithm 2).
  *
  * Phase 1, kernel-search: plain BFS to depth k enumerating *all* label
  * sequences (no vertex marking — every path matters); every visit
  * `(y, seq)` attempts an index insert with `MR(seq)` and registers `y` as a
  * frontier vertex of the kernel candidate `MR(seq)` (every sequence is a
  * power of its own MR, so `y` sits on a candidate `MR^+` path).
  *
  * Phase 2, kernel-BFS: per kernel candidate `L` (length m), a BFS over
  * `(vertex, phase)` states guided by `L^+`; backward search at phase j
  * (j labels of the current copy already prepended) accepts only in-edges
  * labeled `L[m-1-j]`, inserts an entry whenever a copy completes, and
  * applies PR3: a pruned insert stops the expansion through that vertex.
  */
object Kbs {

  def run(g: LabeledGraph, root: Int, k: Int, ins: Inserter, scratch: KbsScratch): Unit = {
    backward(g, root, k, ins, scratch)
    forward(g, root, k, ins, scratch)
  }

  def backward(g: LabeledGraph, root: Int, k: Int, ins: Inserter, scratch: KbsScratch): Unit =
    search(g, root, k, ins, scratch, forwardDir = false)

  def forward(g: LabeledGraph, root: Int, k: Int, ins: Inserter, scratch: KbsScratch): Unit =
    search(g, root, k, ins, scratch, forwardDir = true)

  private final class Frontier {
    var vs: Array[Int] = new Array[Int](8)
    var n: Int = 0
    def add(v: Int): Unit = {
      if (n == vs.length) vs = java.util.Arrays.copyOf(vs, vs.length * 2)
      vs(n) = v; n += 1
    }
  }

  private def search(g: LabeledGraph, root: Int, k: Int, ins: Inserter,
                     scratch: KbsScratch, forwardDir: Boolean): Unit = {
    val adjOff   = if (forwardDir) g.outOff else g.inOff
    val adjVert  = if (forwardDir) g.outDst else g.inSrc
    val adjLabel = if (forwardDir) g.outLabel else g.inLabel

    // ---- kernel-search (depth <= k, all paths) ----
    val kernels = new java.util.HashMap[java.lang.Long, Frontier]()
    scratch.growSearch(1)
    scratch.qv(0) = root; scratch.qs(0) = LabelSeq.Empty
    var head = 0
    var tail = 1
    while (head < tail) {
      val x   = scratch.qv(head)
      val seq = scratch.qs(head)
      head += 1
      val len = LabelSeq.length(seq)
      var i = adjOff(x)
      val end = adjOff(x + 1)
      while (i < end) {
        val y = adjVert(i)
        val l = adjLabel(i)
        val seq2 = if (forwardDir) LabelSeq.append(seq, l) else LabelSeq.prepend(l, seq)
        val m    = LabelSeq.mr(seq2)
        if (forwardDir) ins.insertIn(y, m) else ins.insertOut(y, m)
        var f = kernels.get(m)
        if (f == null) { f = new Frontier; kernels.put(m, f) }
        f.add(y)
        if (len + 1 < k) {
          scratch.growSearch(tail + 1)
          scratch.qv(tail) = y; scratch.qs(tail) = seq2
          tail += 1
        }
        i += 1
      }
    }

    // ---- kernel-BFS per kernel candidate ----
    val it = kernels.entrySet().iterator()
    while (it.hasNext) {
      val e = it.next()
      kernelBfs(g, root, k, e.getKey.longValue(), e.getValue, ins, scratch, forwardDir,
        adjOff, adjVert, adjLabel)
    }
  }

  private def kernelBfs(g: LabeledGraph, root: Int, k: Int, kernel: Long, frontier: Frontier,
                        ins: Inserter, scratch: KbsScratch, forwardDir: Boolean,
                        adjOff: Array[Int], adjVert: Array[Int], adjLabel: Array[Int]): Unit = {
    val m = LabelSeq.length(kernel)
    scratch.stamp += 1
    val stamp = scratch.stamp
    val visit = scratch.visit

    var head = 0
    var tail = 0
    var i = 0
    while (i < frontier.n) {
      val v  = frontier.vs(i)
      val st = v * k // phase 0
      if (visit(st) != stamp) {
        visit(st) = stamp
        scratch.growBfs(tail + 1)
        scratch.bq(tail) = st; tail += 1
      }
      i += 1
    }

    while (head < tail) {
      val st = scratch.bq(head)
      head += 1
      val x     = st / k
      val phase = st % k
      val expected = if (forwardDir) LabelSeq.labelAt(kernel, phase)
                     else LabelSeq.labelAt(kernel, m - 1 - phase)
      var j = adjOff(x)
      val end = adjOff(x + 1)
      while (j < end) {
        if (adjLabel(j) == expected) {
          val y = adjVert(j)
          val complete = phase + 1 == m
          val nphase   = if (complete) 0 else phase + 1
          val nst      = y * k + nphase
          if (visit(nst) != stamp) {
            if (complete && !(if (forwardDir) ins.insertIn(y, kernel) else ins.insertOut(y, kernel))) {
              visit(nst) = stamp // PR3: entry derivable — skip y and everything beyond
            } else {
              visit(nst) = stamp
              scratch.growBfs(tail + 1)
              scratch.bq(tail) = nst; tail += 1
            }
          }
        }
        j += 1
      }
    }
  }
}
