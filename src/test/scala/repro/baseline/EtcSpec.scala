package repro.baseline

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs
import repro.core.{LabelSeq, RlcIndexBuilder}

/** The extended transitive closure baseline: exact agreement with brute
  * force and with the RLC index, plus budget behavior.
  */
class EtcSpec extends AnyFunSuite {

  for (seed <- 1 to 6)
    test(s"ETC ≡ brute force ≡ RLC index on random graph seed=$seed, k=2") {
      val g = TestGraphs.random(seed, n = 18, e = 55, labels = 3)
      val etc = Etc.build(g, 2).get
      val index = RlcIndexBuilder.build(g, 2)
      for (s <- 0 until g.numVertices; t <- 0 until g.numVertices;
           mr <- BruteForce.primitives(3, 2)) {
        val expected = BruteForce.reach(g, s, t, mr)
        assert(etc.query(s, t, mr) == expected, s"etc s=$s t=$t ${LabelSeq.show(mr)}")
        assert(index.query(s, t, mr) == expected, s"idx s=$s t=$t ${LabelSeq.show(mr)}")
      }
    }

  test("ETC concise sets match Def. 2 exactly (not just membership)") {
    val g = TestGraphs.random(42, n = 15, e = 45, labels = 3)
    val etc = Etc.build(g, 2).get
    for (s <- 0 until g.numVertices; t <- 0 until g.numVertices) {
      val expected = BruteForce.concise(g, s, t, 2)
      val got = Option(etc.pairs.get(etc.key(s, t)))
        .map(set => { val b = Set.newBuilder[Long]; set.forEach(l => b += l.longValue()); b.result() })
        .getOrElse(Set.empty[Long])
      assert(got == expected, s"s=$s t=$t")
    }
  }

  test("ETC records vastly more entries than the condensed RLC index") {
    val g = TestGraphs.smallBa(7, n = 60, e = 240, labels = 3)
    val etc = Etc.build(g, 2).get
    val index = RlcIndexBuilder.build(g, 2)
    assert(etc.mrCount > index.entryCount,
      s"etc=${etc.mrCount} rlc=${index.entryCount}")
  }

  test("a 1ms budget aborts on a graph that needs real work") {
    val g = TestGraphs.smallBa(9, n = 200, e = 2000, labels = 3)
    assert(Etc.build(g, 2, budgetMs = 1L).isEmpty)
  }

  test("entry cap aborts the build") {
    val g = TestGraphs.smallBa(9, n = 200, e = 2000, labels = 3)
    assert(Etc.build(g, 2, maxMrEntries = 10L).isEmpty)
  }

  test("size accounting formula") {
    val g = TestGraphs.random(3)
    val etc = Etc.build(g, 2).get
    assert(etc.sizeInBytes == etc.pairCount * 128 + etc.mrCount * 40)
  }
}
