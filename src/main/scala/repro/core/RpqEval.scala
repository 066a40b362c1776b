package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{GraphData, LabeledGraph, Pairs, TransitiveClosure}

/** Structural-recursion RPQ evaluator over DataFrames.
  *
  * For closure-free expressions this is `EvalRPQwithoutKC` of Algorithm 1
  * (used for Type-NULL clauses and for `Post_G`): a label is a selection on
  * the edge relation, concatenation is a join (Lemma 4), alternation is a
  * union. Closures are evaluated via semi-naive transitive closure of the
  * edge-level reduced graph (Lemma 1), which also makes this a full
  * *reference* evaluator that the optimized RTCSharing is differentially
  * tested against.
  */
object RpqEval {
  import GraphData.{Src, Lbl, Dst}

  /** Evaluates any RPQ `r` on `g`, returning the `(s, d)` pair relation
    * `r_G` of Definition 2.
    */
  def eval(g: LabeledGraph, r: Rpq): DataFrame = r match {
    case Rpq.Eps    => Pairs.identity(g.vertices)
    case Rpq.Lbl(l) => g.edges.filter(col(Lbl) === l).select(Src, Dst).distinct()
    case Rpq.Cat(a, b) => Pairs.compose(eval(g, a), eval(g, b))
    case Rpq.Alt(a, b) => Pairs.union(eval(g, a), eval(g, b))
    case Rpq.Plus(x)   => TransitiveClosure.of(eval(g, x))
    case Rpq.Star(x)   => Pairs.union(Pairs.identity(g.vertices), TransitiveClosure.of(eval(g, x)))
  }

  /** `EvalRPQwithoutKC`: evaluates a closure-free RPQ (asserted). */
  def evalWithoutKC(g: LabeledGraph, r: Rpq): DataFrame = {
    require(!r.hasClosure, s"EvalRPQwithoutKC got a Kleene closure in $r")
    eval(g, r)
  }
}
