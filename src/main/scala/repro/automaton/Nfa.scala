package repro.automaton

import repro.core.Rpq
import scala.collection.mutable

/** ε-free nondeterministic finite automaton for RPQ pattern matching.
  *
  * Built by Thompson's construction followed by ε-elimination. This is the
  * pattern-matching substrate of the NoSharing baseline (Yakovets-style
  * automaton-guided traversal, paper §II-B): each graph traversal carries
  * an NFA state; an edge can be followed iff a transition on its label
  * exists from the current state.
  *
  * @param numStates  states are `0 until numStates`
  * @param start      initial state
  * @param accepts    accepting states (after ε-elimination: states whose
  *                   ε-closure intersected the Thompson accept state)
  * @param trans      label transitions `(from, label, to)`
  */
final case class Nfa(numStates: Int, start: Int, accepts: Set[Int],
                     trans: Seq[(Int, String, Int)]) {

  /** True iff the automaton accepts the empty word. */
  def acceptsEmpty: Boolean = accepts.contains(start)

  private lazy val byState: Map[(Int, String), Seq[Int]] =
    trans.groupMap(t => (t._1, t._2))(_._3)

  /** Driver-side acceptance check — the executable specification used to
    * validate the automaton against the Brzozowski matcher.
    */
  def acceptsWord(w: Seq[String]): Boolean = {
    var states = Set(start)
    for (a <- w) states = states.flatMap(q => byState.getOrElse((q, a), Seq.empty))
    states.exists(accepts.contains)
  }
}

object Nfa {

  /** Thompson construction with ε-transitions, then ε-elimination. */
  def fromRpq(r: Rpq): Nfa = {
    val epsEdges = mutable.ArrayBuffer.empty[(Int, Int)]
    val labEdges = mutable.ArrayBuffer.empty[(Int, String, Int)]
    var n = 0
    def fresh(): Int = { n += 1; n - 1 }

    // Returns (start, accept) of the fragment for r.
    def build(r: Rpq): (Int, Int) = r match {
      case Rpq.Eps =>
        val s = fresh(); val a = fresh(); epsEdges += ((s, a)); (s, a)
      case Rpq.Lbl(l) =>
        val s = fresh(); val a = fresh(); labEdges += ((s, l, a)); (s, a)
      case Rpq.Cat(x, y) =>
        val (sx, ax) = build(x); val (sy, ay) = build(y)
        epsEdges += ((ax, sy)); (sx, ay)
      case Rpq.Alt(x, y) =>
        val s = fresh(); val a = fresh()
        val (sx, ax) = build(x); val (sy, ay) = build(y)
        epsEdges ++= Seq((s, sx), (s, sy), (ax, a), (ay, a)); (s, a)
      case Rpq.Star(x) =>
        val s = fresh(); val a = fresh()
        val (sx, ax) = build(x)
        epsEdges ++= Seq((s, sx), (s, a), (ax, sx), (ax, a)); (s, a)
      case Rpq.Plus(x) =>
        val s = fresh(); val a = fresh()
        val (sx, ax) = build(x)
        epsEdges ++= Seq((s, sx), (ax, sx), (ax, a)); (s, a)
    }

    val (start, accept) = build(r)

    // ε-closures by fixpoint (state counts are tiny: O(|r|)).
    val epsAdj = epsEdges.groupMap(_._1)(_._2)
    val closure = Array.tabulate(n) { q =>
      val seen = mutable.Set(q)
      val stack = mutable.ArrayDeque(q)
      while (stack.nonEmpty) {
        val x = stack.removeHead()
        for (y <- epsAdj.getOrElse(x, Seq.empty) if !seen(y)) { seen += y; stack.prepend(y) }
      }
      seen.toSet
    }

    // ε-elimination: q --l--> q2' for q1 ∈ closure(q), (q1, l, q2) and
    // q2' ∈ closure(q2); accepting iff closure(q) hits the Thompson accept.
    val elim = for {
      q <- 0 until n
      q1 <- closure(q)
      (f, l, t) <- labEdges if f == q1
      t2 <- closure(t)
    } yield (q, l, t2)
    val accepts = (0 until n).filter(q => closure(q).contains(accept)).toSet

    Nfa(n, start, accepts, elim.distinct)
  }
}
