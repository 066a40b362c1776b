package repro.core

import repro.{SparkSpec, TestKit}
import repro.graph.{Pairs, TransitiveClosure}

/** The reduced transitive closure: `Compute_RTC` and Theorem 1/2 — the
  * RTC-expanded `R+_G` must equal the direct `TC(G_R)` on every graph.
  */
class RtcSpec extends SparkSpec {
  import spark.implicits._
  private implicit val s: org.apache.spark.sql.SparkSession = spark

  test("Example 6: RTC of G_{b·c} is {(s0,s0),(s0,s1),(s2,s2)}") {
    val grbc = Seq((2L, 4L), (2L, 6L), (3L, 5L), (4L, 2L), (5L, 3L)).toDF("s", "d")
    val data = Rtc.compute(grbc)
    // min-member SCC ids: s0 = {2,4} -> 2, s1 = {6} -> 6, s2 = {3,5} -> 3.
    val rtc = data.rtc.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(rtc == Set((2L, 2L), (2L, 6L), (3L, 3L)))
    assert(data.rtcSize == 3)
  }

  test("Example 6: expanding the RTC reproduces TC(G_{b·c}) (Theorem 1)") {
    val grbc = Seq((2L, 4L), (2L, 6L), (3L, 5L), (4L, 2L), (5L, 3L)).toDF("s", "d")
    val expanded = Pairs.collectSet(Rtc.expand(Rtc.compute(grbc)))
    val expected = Set((2L, 2L), (2L, 4L), (2L, 6L), (3L, 3L), (3L, 5L),
      (4L, 2L), (4L, 4L), (4L, 6L), (5L, 3L), (5L, 5L))
    assert(expanded == expected)
  }

  test("trivial SCC without self-loop contributes no reflexive pair") {
    val chain = Seq((1L, 2L), (2L, 3L)).toDF("s", "d")
    val expanded = Pairs.collectSet(Rtc.expand(Rtc.compute(chain)))
    assert(expanded == Set((1L, 2L), (2L, 3L), (1L, 3L)))
  }

  test("self-loop vertex keeps its reflexive pair through reduction") {
    val g = Seq((1L, 1L), (1L, 2L)).toDF("s", "d")
    val expanded = Pairs.collectSet(Rtc.expand(Rtc.compute(g)))
    assert(expanded == Set((1L, 1L), (1L, 2L)))
  }

  test("RTC is never larger than the full closure") {
    for (seed <- 1 to 5) {
      val edges = TestKit.randomEdges(20, 60, 700 + seed)
      val df = edges.toDF("s", "d")
      val data = Rtc.compute(df)
      assert(data.rtcSize <= TestKit.bruteTc(edges).size)
    }
  }

  for (seed <- 1 to 10)
    test(s"Theorem 1: RTC expansion equals TC(G_R), random seed $seed") {
      val edges = TestKit.randomEdges(numV = 18, numE = 40, seed = 800 + seed)
      val df = edges.toDF("s", "d")
      val viaRtc = Pairs.collectSet(Rtc.expand(Rtc.compute(df)))
      val direct = Pairs.collectSet(TransitiveClosure.of(df))
      assert(viaRtc == direct)
    }

  test("vertex-level reduction effectiveness: dense graph shrinks hard") {
    // Degree-dense random graph: giant SCC, so |RTC| << |TC(G_R)|.
    val edges = TestKit.randomEdges(numV = 40, numE = 200, seed = 900)
    val df = edges.toDF("s", "d")
    val data = Rtc.compute(df)
    val full = TestKit.bruteTc(edges).size
    assert(data.rtcSize < full / 4,
      s"expected strong reduction, got |RTC|=${data.rtcSize} vs |TC|=$full")
  }
}
