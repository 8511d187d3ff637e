package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.baseline.BruteForce
import repro.graph.ExampleGraphs

/** The paper's running example: the Fig. 2 graph must yield exactly the
  * RLC index of Table II (k = 2), the IN-OUT access order quoted in
  * Sec. V-B, and the query answers of Example 3.
  */
class Fig2Spec extends AnyFunSuite {
  private val l1 = 0; private val l2 = 1; private val l3 = 2
  private val Seq(v1, v2, v3, v4, v5, v6) = (0 to 5).toSeq

  private def L(ls: Int*): Long = LabelSeq.encode(ls.toArray)

  private val g = ExampleGraphs.fig2
  private val index = RlcIndexBuilder.build(g, 2)

  test("IN-OUT access order is (v1, v3, v2, v4, v5, v6)") {
    val (aid, order) = RlcIndexBuilder.accessOrder(g)
    assert(order.toSeq == Seq(v1, v3, v2, v4, v5, v6))
    assert(aid(v3) == 2, "aid(v3) = 2 as quoted in Sec. V-B")
  }

  private def outSet(v: Int): Set[(Int, Long)] = {
    var s = Set.empty[(Int, Long)]
    index.out(v).foreachEntry((h, m) => s += ((h, m)))
    s
  }
  private def inSet(v: Int): Set[(Int, Long)] = {
    var s = Set.empty[(Int, Long)]
    index.in(v).foreachEntry((h, m) => s += ((h, m)))
    s
  }

  test("Table II: L_out and L_in of v1") {
    assert(outSet(v1) == Set((v1, L(l2)), (v1, L(l1)), (v1, L(l2, l1))))
    assert(inSet(v1).isEmpty)
  }

  test("Table II: L_out and L_in of v2") {
    assert(outSet(v2) == Set((v1, L(l2, l1)), (v1, L(l1))))
    assert(inSet(v2) == Set((v1, L(l1)), (v1, L(l2, l1))))
  }

  test("Table II: L_out and L_in of v3") {
    assert(outSet(v3) == Set((v1, L(l2)), (v1, L(l2, l1)), (v1, L(l1)), (v3, L(l1, l2))))
    assert(inSet(v3) == Set((v1, L(l2)), (v1, L(l1, l2))))
  }

  test("Table II: L_out and L_in of v4") {
    assert(outSet(v4) == Set((v1, L(l1)), (v3, L(l1, l2))))
    assert(inSet(v4) == Set((v1, L(l2))))
  }

  test("Table II: L_out and L_in of v5") {
    assert(outSet(v5) == Set((v1, L(l1)), (v3, L(l1, l2))))
    assert(inSet(v5) == Set((v1, L(l1, l2)), (v1, L(l1)), (v3, L(l1, l2)), (v2, L(l2))))
  }

  test("Table II: L_out and L_in of v6") {
    assert(outSet(v6).isEmpty)
    assert(inSet(v6) == Set((v1, L(l2, l1)), (v3, L(l1)), (v3, L(l2, l3)), (v4, L(l3))))
  }

  test("Example 3: Q1(v3, v6, (l2,l1)+) = true via Case 1 with hop v1") {
    assert(index.outContains(v3, v1, L(l2, l1)))
    assert(index.inContains(v6, v1, L(l2, l1)))
    assert(index.answer(v3, v6, L(l2, l1)))
  }

  test("Example 3: Q2(v1, v2, (l2,l1)+) = true via Case 2") {
    assert(index.inContains(v2, v1, L(l2, l1)))
    assert(index.answer(v1, v2, L(l2, l1)))
  }

  test("Example 3: Q3(v1, v3, (l1)+) = false although v1 reaches v3") {
    assert(index.inContains(v3, v1, L(l2)))
    assert(!index.answer(v1, v3, L(l1)))
  }

  test("index is condensed (Def. 5)") {
    assert(index.condensedViolations == 0L)
  }

  test("index answers all pairs × all primitive constraints like brute force") {
    for {
      s  <- 0 until g.numVertices
      t  <- 0 until g.numVertices
      mr <- BruteForce.primitives(g.numLabels, 2)
    } assert(index.query(s, t, mr) == BruteForce.reach(g, s, t, mr),
      s"s=$s t=$t L=${LabelSeq.show(mr)}")
  }

  test("entry count matches Table II (26 entries)") {
    assert(index.entryCount == 26L)
  }
}
