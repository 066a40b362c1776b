package repro.core

import repro.{Oracle, SparkSpec, TestKit}
import repro.baselines.{FullCache, FullSharing, NoSharing}
import repro.graph.{GraphData, Pairs}
import repro.harness.Metrics

/** RTCSharing (Algorithms 1–2): correctness against the reference
  * evaluator, both baselines, the DuckDB oracle, the paper's worked
  * examples, and the RTC cache-sharing behaviour of Example 7.
  */
class RtcSharingSpec extends SparkSpec {
  private implicit val s: org.apache.spark.sql.SparkSession = spark

  private def graphOf(triples: Seq[(Long, String, Long)]) =
    GraphData.fromTuples(spark, triples)

  private def rtcEval(g: repro.graph.LabeledGraph, q: String,
                      cache: RtcCache = new RtcCache): Set[(Long, Long)] =
    Pairs.collectSet(RtcSharing.evaluate(g, Rpq.parse(q), cache))

  private val tiny = graphOf(Seq(
    (1L, "a", 2L), (2L, "b", 3L), (3L, "c", 4L), (2L, "a", 4L),
    (4L, "b", 1L), (1L, "b", 3L)))

  // ------------------------------------------------------- basic clauses

  test("closure-free clause goes through EvalRPQwithoutKC") {
    assert(rtcEval(tiny, "a.b") == Set((1L, 3L), (2L, 1L)))
  }
  test("bare Kleene plus (Pre = Post = ε)") {
    assert(rtcEval(tiny, "a+") == Set((1L, 2L), (2L, 4L), (1L, 4L)))
  }
  test("bare Kleene star adds the identity") {
    val got = rtcEval(tiny, "a*")
    assert((1L to 4L).forall(v => got.contains((v, v))) && got.contains((1L, 4L)))
  }
  test("batch unit with Pre and Post") {
    // b.(a)+.b : 4 -b-> 1 -a-> 2 -a-> 4 ... then -b-> {1,3}
    val expected = TestKit.bruteEval(Seq(
      (1L, "a", 2L), (2L, "b", 3L), (3L, "c", 4L), (2L, "a", 4L),
      (4L, "b", 1L), (1L, "b", 3L)), Rpq.parse("b.a+.b"))
    assert(rtcEval(tiny, "b.a+.b") == expected)
  }
  test("alternation of clauses unions batch-unit results") {
    assert(rtcEval(tiny, "a+|b") ==
      (rtcEval(tiny, "a+") ++ rtcEval(tiny, "b")))
  }
  test("star batch unit includes the Pre·Post shortcut: a.b*.c") {
    // (a.b*.c)_G = (a.c)_G ∪ (a.b+.c)_G
    val viaPlus = rtcEval(tiny, "a.b+.c")
    val direct = rtcEval(tiny, "a.c")
    assert(rtcEval(tiny, "a.b*.c") == (viaPlus ++ direct))
  }

  // --------------------------------------------- Example 7 recursion tree

  test("Example 7 query 2: a.(a.b)+.b evaluates and caches RTC for a.b") {
    val cache = new RtcCache
    val got = rtcEval(tiny, "a.(a.b)+.b", cache)
    assert(cache.contains(Rpq.parse("a.b")))
    assert(got == TestKit.bruteEval(Seq(
      (1L, "a", 2L), (2L, "b", 3L), (3L, "c", 4L), (2L, "a", 4L),
      (4L, "b", 1L), (1L, "b", 3L)), Rpq.parse("a.(a.b)+.b")))
  }

  test("Example 7 query 3: nested closures reuse cached RTCs") {
    val cache = new RtcCache
    rtcEval(tiny, "a.(a.b)+.b", cache)            // populates RTC for a.b
    assert(cache.size == 1)
    rtcEval(tiny, "(a.b)*.b+", cache)             // populates RTC for b, reuses a.b
    assert(cache.contains(Rpq.parse("b")) && cache.size == 2)
    val got = rtcEval(tiny, "(a.b)*.b+.(a.b+.c)+", cache)
    // now RTCs for a.b, b, and a.b+.c exist; a.b and b were reused
    assert(cache.contains(Rpq.parse("a.b+.c")) && cache.size == 3)
    assert(got == TestKit.bruteEval(Seq(
      (1L, "a", 2L), (2L, "b", 3L), (3L, "c", 4L), (2L, "a", 4L),
      (4L, "b", 1L), (1L, "b", 3L)), Rpq.parse("(a.b)*.b+.(a.b+.c)+")))
  }

  test("cache sharing across queries computes each RTC once") {
    val cache = new RtcCache
    rtcEval(tiny, "a.(b.c)+.a", cache)
    val sizeAfterFirst = cache.size
    rtcEval(tiny, "b.(b.c)+.c", cache)
    assert(cache.size == sizeAfterFirst, "second query must reuse the RTC for b.c")
  }

  // ------------------------------------------------------- differential

  private val queries = Seq("a", "a.b", "a+", "(a.b)+", "a.b+.c", "d.(b.c)+.c",
    "a.(b.c)+", "(a.b)*.b+", "a.b*.c", "(a|b)+", "a+|b.c", "(a|b).(c.d)+",
    "a.(a.b)+.b", "(a.b)*.b+.(a.b+.c)+")
  for (seed <- 1 to 4; q <- queries)
    test(s"RTCSharing ≡ NFA reference: '$q' on random graph seed $seed") {
      val labels = Seq("a", "b", "c", "d")
      val triples = TestKit.randomTriples(numV = 11, numE = 38, numLabels = 4, seed = 1000 + seed)
        .map { case (sv, l, d) => (sv, labels(l.drop(1).toInt), d) }
      val g = graphOf(triples)
      assert(rtcEval(g, q) == TestKit.bruteEval(triples, Rpq.parse(q)),
        s"query $q seed $seed")
    }

  for (seed <- 1 to 3; q <- Seq("a.b+.c", "(a.b)+", "a.(b.c)+.d", "b+.a"))
    test(s"RTCSharing ≡ FullSharing ≡ NoSharing: '$q' seed $seed") {
      val labels = Seq("a", "b", "c", "d")
      val triples = TestKit.randomTriples(numV = 10, numE = 34, numLabels = 4, seed = 1100 + seed)
        .map { case (sv, l, d) => (sv, labels(l.drop(1).toInt), d) }
      val g = graphOf(triples)
      val rtc = rtcEval(g, q)
      val full = Pairs.collectSet(FullSharing.evaluate(g, Rpq.parse(q), new FullCache))
      val no = Pairs.collectSet(NoSharing.evaluate(g, Rpq.parse(q)))
      assert(rtc == full, s"RTC vs Full on $q")
      assert(rtc == no, s"RTC vs No on $q")
    }

  // ------------------------------------------------------- DuckDB oracle

  for (seed <- 1 to 3)
    test(s"DuckDB oracle: batch unit a.(b.c)+.d, random graph seed $seed") {
      val labels = Seq("a", "b", "c", "d")
      val triples = TestKit.randomTriples(numV = 10, numE = 36, numLabels = 4, seed = 1200 + seed)
        .map { case (sv, l, d) => (sv, labels(l.drop(1).toInt), d) }
      val g = graphOf(triples)
      val df = RtcSharing.evaluate(g, Rpq.parse("a.(b.c)+.d"), new RtcCache)
      Oracle.assertEquivalent(df,
        TestKit.duckBatchUnitSql("a", Seq("b", "c"), "d"), "edges" -> g.edges)
    }

  test("DuckDB oracle: batch unit on the tiny graph") {
    val df = RtcSharing.evaluate(tiny, Rpq.parse("b.a+.b"), new RtcCache)
    Oracle.assertEquivalent(df,
      TestKit.duckBatchUnitSql("b", Seq("a"), "b"), "edges" -> tiny.edges)
  }

  // ------------------------------------------------------------- metrics

  test("metrics: batch unit accrues all three parts, shared on miss only") {
    val cache = new RtcCache
    val m1 = new Metrics
    RtcSharing.evaluate(tiny, Rpq.parse("a.(b.c)+.a"), cache, m1).count()
    assert(m1.ms(Metrics.SharedData) > 0, "cache miss must time Shared_Data")
    assert(m1.ms(Metrics.PreJoin) > 0)
    assert(m1.ms(Metrics.Remainder) > 0)
    val m2 = new Metrics
    RtcSharing.evaluate(tiny, Rpq.parse("b.(b.c)+.b"), cache, m2).count()
    assert(m2.ms(Metrics.SharedData) == 0, "cache hit must not re-time Shared_Data")
    assert(m2.ms(Metrics.PreJoin) > 0)
  }

  test("empty Pre_G produces empty batch-unit result") {
    assert(rtcEval(tiny, "z.a+.b") == Set.empty)
  }
  test("empty R produces empty closure result for plus") {
    assert(rtcEval(tiny, "a.z+.b") == Set.empty)
  }
  test("empty R with star degenerates to Pre·Post") {
    assert(rtcEval(tiny, "a.z*.b") == rtcEval(tiny, "a.b"))
  }
}
