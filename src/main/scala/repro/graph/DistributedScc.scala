package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Distributed SCC via iterative DataFrame joins (Orzan's coloring scheme).
  *
  * The reproduction's default SCC is driver-side Tarjan ([[Scc]]) — the
  * paper's own choice, valid because `G_R` is small. This module exists so
  * the vertex-level reduction also has a pure dataflow implementation, per
  * the distributed-dataflow framing of the reproduction:
  *
  *  1. '''Forward coloring''': every vertex starts with color = own id;
  *     colors propagate along edges to a fixpoint taking `max`, so
  *     `color(v)` = max id that can reach `v`.
  *  2. '''Backward collection''': for each color root `r` (vertex with
  *     `color(r) = r`), the SCC of `r` is the set of vertices with color
  *     `r` that reach `r` through same-colored vertices.
  *  3. Completed SCCs are removed and the process repeats on the rest.
  *
  * Worst-case many rounds (long chains), so this is used on small graphs
  * in tests; ids are normalized to min-member to match [[Scc.tarjan]].
  */
object DistributedScc {
  import GraphData.{Src, Dst}

  /** @param edges unlabeled `(s, d)` edge relation
    * @return `(v, scc)` with scc = min member VID, as in [[Scc.assign]]
    */
  def assign(edges: DataFrame)(implicit spark: SparkSession): DataFrame = {
    val e0 = edges.select(Src, Dst).distinct().localCheckpoint()
    var remV = e0.select(col(Src).as("v")).union(e0.select(col(Dst).as("v")))
      .distinct().localCheckpoint()
    var remE = e0
    var result = spark.range(0).select(col("id").as("v"), col("id").as("scc"))

    while (remV.limit(1).count() > 0) {
      // 1. Forward max-color propagation to fixpoint.
      var colors = remV.select(col("v"), col("v").as("c")).localCheckpoint()
      var changed = true
      while (changed) {
        val pushed = remE.alias("e")
          .join(colors.alias("c0"), col(s"e.$Src") === col("c0.v"))
          .select(col(s"e.$Dst").as("v"), col("c0.c").as("c"))
        val next = colors.unionByName(pushed)
          .groupBy("v").agg(max("c").as("c"))
          .localCheckpoint()
        changed = next.alias("n")
          .join(colors.alias("o"), col("n.v") === col("o.v"))
          .filter(col("n.c") =!= col("o.c"))
          .limit(1).count() > 0
        colors = next
      }

      // 2. Backward collection within color classes, from each color root.
      var marked = colors.filter(col("v") === col("c")).localCheckpoint()
      var frontier = marked
      while (frontier.limit(1).count() > 0) {
        val pre = remE.alias("e")
          .join(frontier.alias("f"), col(s"e.$Dst") === col("f.v"))
          .join(colors.alias("cc"), col(s"e.$Src") === col("cc.v"))
          .filter(col("cc.c") === col("f.c"))
          .select(col(s"e.$Src").as("v"), col("f.c").as("c"))
          .distinct()
        frontier = pre.except(marked).localCheckpoint()
        marked = marked.unionByName(frontier).localCheckpoint()
      }

      result = result.unionByName(marked.select(col("v"), col("c").as("scc")))
        .localCheckpoint()
      remV = remV.alias("rv")
        .join(marked.alias("m"), col("rv.v") === col("m.v"), "left_anti")
        .localCheckpoint()
      remE = remE.alias("re")
        .join(marked.alias("m1"), col(s"re.$Src") === col("m1.v"), "left_anti")
        .join(marked.alias("m2"), col(s"re.$Dst") === col("m2.v"), "left_anti")
        .localCheckpoint()
    }

    // Normalize component ids to the minimum member VID (Tarjan parity).
    val minIds = result.groupBy("scc").agg(min("v").as("minv"))
    result.alias("r")
      .join(minIds.alias("m"), col("r.scc") === col("m.scc"))
      .select(col("r.v").as("v"), col("m.minv").as("scc"))
  }
}
