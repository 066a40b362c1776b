package repro.automaton

import org.scalatest.funsuite.AnyFunSuite
import repro.TestKit
import repro.core.Rpq

/** Thompson NFA vs the Brzozowski-derivative matcher — the automaton is
  * the pattern-matching substrate of the NoSharing baseline, so its
  * acceptance must coincide with the regex semantics on every word.
  */
class AutomatonSpec extends AnyFunSuite {

  private def check(q: String, words: Seq[Seq[String]]): Unit = {
    val r = Rpq.parse(q)
    val nfa = Nfa.fromRpq(r)
    for (w <- words)
      assert(nfa.acceptsWord(w) == Rpq.matches(r, w),
        s"query $q disagrees on word $w")
  }

  private def allWords(alphabet: Seq[String], maxLen: Int): Seq[Seq[String]] =
    (0 to maxLen).flatMap(n =>
      Seq.fill(n)(alphabet).foldLeft(Seq(Seq.empty[String]))((acc, ls) =>
        for { w <- acc; l <- ls } yield w :+ l))

  private val fixedQueries = Seq(
    "a", "ε", "a.b", "a|b", "a+", "a*", "(a.b)+", "(a|b)*", "a.(b.c)+.c",
    "d.(b.c)+.c", "(a.b)*.b+", "(a.b+.c)+", "a+.b+", "a*.b*", "(a+)+",
    "(a*)*", "a.(b|c).d", "((a|b).c)+", "a.a.a", "(a|b|c)+")

  for (q <- fixedQueries)
    test(s"NFA ≡ Brzozowski on all words up to length 5: '$q'") {
      check(q, allWords(Seq("a", "b", "c", "d"), 5))
    }

  for (seed <- 1 to 30)
    test(s"NFA ≡ Brzozowski on random regex, seed $seed") {
      val rnd = new scala.util.Random(seed)
      val r = TestKit.randomRpq(Seq("a", "b", "c"), depth = 3, rnd = rnd)
      val nfa = Nfa.fromRpq(r)
      val words = allWords(Seq("a", "b", "c"), 4) ++
        Seq.fill(100)(Seq.fill(rnd.nextInt(8))(Seq("a", "b", "c")(rnd.nextInt(3))))
      for (w <- words)
        assert(nfa.acceptsWord(w) == Rpq.matches(r, w), s"regex ${r.show}, word $w")
    }

  test("acceptsEmpty matches nullability") {
    for (q <- Seq("a", "a*", "a+", "ε", "a.b", "a*.b*", "(a.b)*", "a|ε"))
      assert(Nfa.fromRpq(Rpq.parse(q)).acceptsEmpty == Rpq.nullable(Rpq.parse(q)), q)
  }

  test("transitions are ε-free and within state bounds") {
    for (q <- fixedQueries) {
      val nfa = Nfa.fromRpq(Rpq.parse(q))
      assert(nfa.trans.forall { case (f, l, t) =>
        f >= 0 && f < nfa.numStates && t >= 0 && t < nfa.numStates && l.nonEmpty })
    }
  }

  test("empty-language-ish query ε has no transitions") {
    val nfa = Nfa.fromRpq(Rpq.Eps)
    assert(nfa.trans.isEmpty && nfa.acceptsEmpty)
  }
}
