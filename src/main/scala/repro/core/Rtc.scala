package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{GraphData, Pairs, Scc, TransitiveClosure}

/** The reduced transitive closure `RTC = TC(Ḡ_R)` plus the SCC relation it
  * is expressed over (paper §III-C).
  *
  * @param scc     relation `SCC(V, S)` as columns `(v, scc)` — every vertex
  *                of `G_R` with the SCC containing it
  * @param rtc     relation `R̄+_G(START_S, END_S)` as columns `(ss, es)` —
  *                the transitive closure of the condensed graph `Ḡ_R`
  * @param rtcSize number of pairs in the RTC (the paper's shared-data size
  *                for RTCSharing, Fig. 11)
  */
final case class RtcData(scc: DataFrame, rtc: DataFrame, rtcSize: Long)

object Rtc {
  import GraphData.{Src, Dst}

  /** `Compute_RTC` (Algorithm 1 line 11): vertex-level reduction of `G_R`
    * followed by semi-naive transitive closure of `Ḡ_R`.
    *
    * @param rg the edge relation of `G_R`, i.e. `R_G` (`(s, d)` pairs)
    */
  def compute(rg: DataFrame)(implicit spark: SparkSession): RtcData = {
    val scc = Scc.assign(rg).localCheckpoint()
    val condensed = Scc.condense(rg, scc).localCheckpoint()
    val rtc = TransitiveClosure.of(condensed)
      .select(col(Src).as("ss"), col(Dst).as("es"))
      .localCheckpoint()
    RtcData(scc, rtc, rtc.count())
  }

  /** Theorem 2: materializes `R+_G` from the RTC —
    * `π_{SSCC.V, ESCC.V}(ρ_SSCC(SCC) ⋈ R̄+_G ⋈ ρ_ESCC(SCC))`.
    * Used by tests; RTCSharing itself never expands the full closure.
    */
  def expand(data: RtcData): DataFrame =
    data.scc.alias("sscc")
      .join(data.rtc.alias("t"), col("sscc.scc") === col("t.ss"))
      .join(data.scc.alias("escc"), col("t.es") === col("escc.scc"))
      .select(col("sscc.v").as(Src), col("escc.v").as(Dst))
}
