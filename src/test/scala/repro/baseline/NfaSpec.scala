package repro.baseline

import java.util.SplittableRandom
import org.scalatest.funsuite.AnyFunSuite
import repro.core.LabelSeq

/** Automata construction: runs over label strings must accept exactly the
  * intended languages.
  */
class NfaSpec extends AnyFunSuite {

  private def run(nfa: Nfa, word: Seq[Int]): Boolean = {
    var q = nfa.start
    for (l <- word) {
      if (q < 0) return false
      q = nfa.trans(q)(l)
    }
    q >= 0 && nfa.accept(q)
  }

  private def isPower(word: Seq[Int], mr: Seq[Int]): Boolean =
    word.nonEmpty && word.length % mr.length == 0 &&
      word.indices.forall(i => word(i) == mr(i % mr.length))

  for (m <- 1 to 3)
    test(s"kleenePlus accepts exactly L^+ (|L|=$m), exhaustive words up to length 7") {
      val rng = new SplittableRandom(m)
      for (_ <- 1 to 10) {
        val L = Array.fill(m)(rng.nextInt(3))
        val nfa = Nfa.kleenePlus(LabelSeq.encode(L), 3)
        def words(len: Int): Iterator[List[Int]] =
          if (len == 0) Iterator(Nil)
          else words(len - 1).flatMap(w => (0 until 3).iterator.map(w :+ _))
        for (len <- 0 to 7; w <- words(len))
          assert(run(nfa, w) == isPower(w, L.toSeq), s"L=${L.toSeq} w=$w")
      }
    }

  test("kleenePlus rejects the empty word even when s = t") {
    val nfa = Nfa.kleenePlus(LabelSeq.encode(0), 2)
    assert(!run(nfa, Nil))
    assert(run(nfa, Seq(0)))
  }

  test("concatPlus accepts exactly a^+ b^+, exhaustive words up to length 8") {
    val nfa = Nfa.concatPlus(0, 1, 3)
    def words(len: Int): Iterator[List[Int]] =
      if (len == 0) Iterator(Nil)
      else words(len - 1).flatMap(w => (0 until 3).iterator.map(w :+ _))
    def expected(w: Seq[Int]): Boolean = {
      val i = w.indexWhere(_ != 0)
      w.length >= 2 && w.head == 0 && i > 0 && w.drop(i).forall(_ == 1)
    }
    for (len <- 0 to 8; w <- words(len))
      assert(run(nfa, w) == expected(w), s"w=$w")
  }

  test("concatPlus requires distinct labels") {
    intercept[IllegalArgumentException](Nfa.concatPlus(1, 1, 3))
  }

  test("reversed transitions invert the DFA") {
    val nfa = Nfa.kleenePlus(LabelSeq.encode(0, 1), 2)
    for (p <- 0 until nfa.numStates; l <- 0 until 2) {
      val q = nfa.trans(p)(l)
      if (q >= 0) assert(nfa.reversed(q)(l).contains(p))
    }
    val total = nfa.reversed.flatten.map(_.size).sum
    assert(total == nfa.trans.flatten.count(_ >= 0))
  }
}
