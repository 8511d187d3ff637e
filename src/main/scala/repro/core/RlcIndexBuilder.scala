package repro.core

import repro.graph.LabeledGraph

/** Sequential indexing algorithm (paper Algorithm 2): backward + forward
  * eager KBS from every vertex in IN-OUT access order, with pruning rules
  *
  *  - PR1: skip an entry whose k-MR is already derivable from the current
  *    index snapshot (a Query against the index under construction);
  *  - PR2: skip an entry when the search root has a larger access id than
  *    the visited vertex (the visited vertex's own, earlier search covered
  *    the path);
  *  - PR3: inside kernel-BFS, a pruned insert also prunes the traversal
  *    through that vertex (implemented in [[Kbs]]).
  */
object RlcIndexBuilder {

  /** IN-OUT ordering: vertices sorted by `(|out(v)|+1) * (|in(v)|+1)`
    * descending, ties by vertex id ascending; returns `aid` with
    * `aid(v)` = 1-based rank.
    */
  def accessOrder(g: LabeledGraph): (Array[Int], Array[Int]) = {
    val order = (0 until g.numVertices).toArray.map(v => v)
    val score = Array.tabulate(g.numVertices) { v =>
      (g.outDegree(v) + 1).toLong * (g.inDegree(v) + 1)
    }
    val sorted = order.sortWith { (a, b) =>
      val sa = score(a); val sb = score(b)
      if (sa != sb) sa > sb else a < b
    }
    val aid = new Array[Int](g.numVertices)
    var r = 0
    while (r < sorted.length) { aid(sorted(r)) = r + 1; r += 1 }
    (aid, sorted)
  }

  /** Live inserter: PR2 by access id, PR1 via a Query on the index under
    * construction (the aid-sorted entry lists make the Case-1 merge join
    * scan only the shared hub prefix of both lists, which keeps PR1 cheap).
    */
  private final class LiveInserter(index: RlcIndex, val aidArr: Array[Int]) extends Inserter {
    var root: Int = -1
    def insertOut(y: Int, mr: Long): Boolean =
      if (aidArr(root) > aidArr(y) || index.query(y, root, mr)) false
      else { index.addOut(y, root, mr); true }
    def insertIn(y: Int, mr: Long): Boolean =
      if (aidArr(root) > aidArr(y) || index.query(root, y, mr)) false
      else { index.addIn(y, root, mr); true }
  }

  /** Run Algorithm 2's per-root KBS sequentially for the given roots (which
    * must come in access-id order), inserting into `index` live. Also the
    * sequential-head phase of the distributed builder.
    */
  def runRoots(g: LabeledGraph, k: Int, index: RlcIndex, roots: Seq[Int],
               scratch: KbsScratch): Unit = {
    val ins = new LiveInserter(index, index.aid)
    roots.foreach { root =>
      ins.root = root
      Kbs.run(g, root, k, ins, scratch)
    }
  }

  /** Build the RLC index for `g` with parameter `k`. */
  def build(g: LabeledGraph, k: Int): RlcIndex = {
    require(k >= 1 && k <= LabelSeq.MaxLen, s"k=$k outside 1..${LabelSeq.MaxLen}")
    val (aid, order) = accessOrder(g)
    val index = new RlcIndex(g.numVertices, k, aid)
    runRoots(g, k, index, order.toIndexedSeq, new KbsScratch(g.numVertices, k))
    index
  }
}
