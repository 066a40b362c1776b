package repro.baselines

import repro.{SparkSpec, TestKit}
import repro.core.{Rpq, RpqEval}
import repro.graph.{GraphData, Pairs}
import repro.harness.Metrics

/** FullSharing baseline: shares the materialized `R+_G`; must agree with
  * the reference evaluator while caching per canonical `R`.
  */
class FullSharingSpec extends SparkSpec {
  private implicit val s: org.apache.spark.sql.SparkSession = spark

  private def graphOf(triples: Seq[(Long, String, Long)]) =
    GraphData.fromTuples(spark, triples)

  private val tiny = graphOf(Seq(
    (1L, "a", 2L), (2L, "b", 3L), (3L, "c", 4L), (2L, "a", 4L),
    (4L, "b", 1L), (1L, "b", 3L)))

  private def full(g: repro.graph.LabeledGraph, q: String,
                   cache: FullCache = new FullCache): Set[(Long, Long)] =
    Pairs.collectSet(FullSharing.evaluate(g, Rpq.parse(q), cache))

  test("closure-free clause") { assert(full(tiny, "a.b") == Set((1L, 3L), (2L, 1L))) }
  test("bare plus") { assert(full(tiny, "a+") == Set((1L, 2L), (2L, 4L), (1L, 4L))) }
  test("star includes identity via Pre_G union") {
    val got = full(tiny, "a*")
    assert((1L to 4L).forall(v => got.contains((v, v))))
  }
  test("batch unit with Pre and Post") {
    assert(full(tiny, "b.a+.b") == TestKit.bruteEval(Seq(
      (1L, "a", 2L), (2L, "b", 3L), (3L, "c", 4L), (2L, "a", 4L),
      (4L, "b", 1L), (1L, "b", 3L)), Rpq.parse("b.a+.b")))
  }

  test("cache: R+_G computed once across queries sharing R") {
    val cache = new FullCache
    val m1 = new Metrics
    FullSharing.evaluate(tiny, Rpq.parse("a.(b.c)+.a"), cache, m1).count()
    assert(m1.ms(Metrics.SharedData) > 0)
    val m2 = new Metrics
    FullSharing.evaluate(tiny, Rpq.parse("b.(b.c)+.c"), cache, m2).count()
    assert(m2.ms(Metrics.SharedData) == 0, "second query must reuse R+_G")
    assert(cache.contains(Rpq.parse("b.c")))
  }

  test("totalSize reports the number of shared pairs") {
    val cache = new FullCache
    FullSharing.evaluate(tiny, Rpq.parse("a+"), cache).count()
    assert(cache.totalSize == 3) // (1,2),(2,4),(1,4)
  }

  for (seed <- 1 to 4; q <- Seq("a+", "a.b+.c", "(a.b)+", "d.(b.c)+.c", "a.b*.c", "(a|b)+"))
    test(s"FullSharing ≡ NFA reference: '$q' seed $seed") {
      val labels = Seq("a", "b", "c", "d")
      val triples = TestKit.randomTriples(numV = 11, numE = 36, numLabels = 4, seed = 1300 + seed)
        .map { case (sv, l, d) => (sv, labels(l.drop(1).toInt), d) }
      val g = graphOf(triples)
      assert(full(g, q) == TestKit.bruteEval(triples, Rpq.parse(q)), s"query $q seed $seed")
    }
}
